package repro.core

import org.apache.spark.sql.DataFrame
import repro.ReproSpec

/** End-to-end engine behaviour: refresh actions, DVS, initialization
  * timestamp selection, error handling, time travel (§3, §5).
  */
class EngineSpec extends ReproSpec {
  private lazy val testImplicits = spark.implicits
  import testImplicits._

  private def kv(rows: (Int, String, Double)*): DataFrame = rows.toDF("k", "cat", "v")

  private val aggQuery =
    Aggregate(Scan("events"), Seq("cat"), Seq("n" -> "count(1)", "s" -> "sum(v)"))

  test("create + initialize computes the defining query (DVS at init)") {
    val (e, _) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0), (2, "b", 2.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    assertSameRows(e.read("agg"), Eval.snapshot(aggQuery, _ => e.read("events")))
  }

  test("querying an uninitialized DT is an error (§3.1)") {
    val (e, _) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)), sync = false)
    intercept[IllegalArgumentException](e.read("agg"))
  }

  test("NO_DATA refresh advances the data timestamp with no new version (§3.3.2)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    val versionsBefore = e.tm.table("agg").versionCount
    clock.advance(100)
    val r = e.refresh("agg", clock.nowSeconds)
    assert(r.action == NoData && r.changedRows == 0)
    assert(e.tm.table("agg").versionCount == versionsBefore)
    assert(e.dataTimestamp("agg") == clock.nowSeconds)
  }

  test("incremental refresh merges changes and matches recompute (DVS property §6.1)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0), (2, "b", 2.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    clock.advance(10)
    e.dml("events", kv((3, "a", 5.0), (4, "c", 7.0)), kv((2, "b", 2.0)))
    clock.advance(10)
    val r = e.refresh("agg", clock.nowSeconds)
    assert(r.action == IncrementalRefresh)
    assertSameRows(e.read("agg"), Eval.snapshot(aggQuery, _ => e.read("events")))
  }

  test("FULL mode recomputes from scratch and still matches") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    val scalar = Aggregate(Scan("events"), Nil, Seq("total" -> "sum(v)", "n" -> "count(1)"))
    e.createDynamicTable(DtSpec("tot", scalar, LagSeconds(600), FullMode))
    clock.advance(5)
    e.insert("events", kv((2, "b", 3.5)))
    clock.advance(5)
    val r = e.refresh("tot", clock.nowSeconds)
    assert(r.action == FullRefresh)
    assert(e.read("tot").collect().head.getDouble(0) == 4.5)
  }

  test("upstream replace forces REINITIALIZE of incremental DTs (§5.4)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0), (2, "b", 2.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    clock.advance(5)
    e.replaceBaseTable("events", kv((9, "z", 9.0)))
    clock.advance(5)
    val r = e.refresh("agg", clock.nowSeconds)
    assert(r.action == Reinitialize)
    assertSameRows(e.read("agg"), Eval.snapshot(aggQuery, _ => e.read("events")))
  }

  test("refreshes chain across a multi-DT graph at one data timestamp (DVS §3.1.2)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0), (2, "b", 2.0), (3, "a", 3.0)))
    val filtered = Filter(Scan("events"), "v >= 2")
    e.createDynamicTable(DtSpec("big", filtered, LagSeconds(600)))
    val agg2 = Aggregate(Scan("big"), Seq("cat"), Seq("n" -> "count(1)"))
    e.createDynamicTable(DtSpec("agg2", agg2, LagSeconds(600)))
    clock.advance(10)
    e.insert("events", kv((4, "c", 10.0), (5, "a", 0.5)))
    clock.advance(10)
    val ts = clock.nowSeconds
    val results = e.refreshGraphAt(ts)
    assert(results.map(_.dt) == Seq("big", "agg2"))
    assert(e.dataTimestamp("big") == ts && e.dataTimestamp("agg2") == ts)
    assertSameRows(e.read("agg2"),
      Eval.snapshot(agg2, _ => Eval.snapshot(filtered, _ => e.read("events"))))
  }

  test("downstream refresh without aligned upstream version fails (§6.1 validation #1)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("up", Filter(Scan("events"), "v > 0"), LagSeconds(600)))
    e.createDynamicTable(DtSpec("down", Filter(Scan("up"), "v > 1"), LagSeconds(600)))
    clock.advance(10)
    e.insert("events", kv((2, "b", 2.0)))
    clock.advance(10)
    // refresh downstream WITHOUT refreshing upstream at this timestamp
    val ex = intercept[IllegalStateException](e.refresh("down", clock.nowSeconds))
    assert(ex.getMessage.contains("snapshot-isolation"))
  }

  test("initialization reuses a recent upstream data timestamp (§3.1.2)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("up", Filter(Scan("events"), "v > 0"), LagSeconds(600)))
    val upTs = e.dataTimestamp("up")
    clock.advance(120) // within the 600 s lag
    e.createDynamicTable(DtSpec("down", Filter(Scan("up"), "v > 0"), LagSeconds(600)))
    assert(e.dataTimestamp("down") == upTs,
      "downstream init should reuse upstream's data timestamp instead of re-refreshing")
    assert(e.dataTimestamp("down") < clock.nowSeconds, "initialized to a timestamp before creation")
  }

  test("initialization refreshes stale upstream when outside target lag (§3.1.2)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("up", Filter(Scan("events"), "v > 0"), LagSeconds(600)))
    val upTs0 = e.dataTimestamp("up")
    clock.advance(100_000) // far beyond the lag
    e.createDynamicTable(DtSpec("down", Filter(Scan("up"), "v > 0"), LagSeconds(600)))
    assert(e.dataTimestamp("up") > upTs0, "upstream must be re-refreshed")
    assert(e.dataTimestamp("down") == e.dataTimestamp("up"))
  }

  test("manual refresh picks a fresh timestamp and refreshes the closure (§3.1.2)") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("up", Filter(Scan("events"), "v > 0"), LagSeconds(600)))
    e.createDynamicTable(DtSpec("down", Filter(Scan("up"), "v > 0"), LagSeconds(600)))
    clock.advance(50)
    e.insert("events", kv((2, "b", 2.0)))
    clock.advance(50)
    val r = e.refreshManual("down")
    assert(r.dataTs >= clock.nowSeconds)
    assert(e.dataTimestamp("up") == r.dataTs)
    assert(e.read("down").count() == 2)
  }

  test("time travel: readAt returns historical contents at each data timestamp") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    val t0 = e.dataTimestamp("agg")
    clock.advance(10); e.insert("events", kv((2, "a", 4.0)))
    clock.advance(10); val t1 = clock.nowSeconds; e.refresh("agg", t1)
    assert(e.readAt("agg", t0).collect().head.getAs[Long]("n") == 1L)
    assert(e.readAt("agg", t1).collect().head.getAs[Long]("n") == 2L)
  }

  test("failed refreshes count up and suspend the DT at the threshold (§3.3.3)") {
    val (e, clock) = newEngine(failureThreshold = 3)
    e.createBaseTable("events", kv((1, "a", 1.0)))
    // division by zero on refresh only when data changes
    val bad = Project(Scan("events"), Seq("k" -> "k", "boom" -> "cast(v / (v - 5.0) as double)"))
    e.createDynamicTable(DtSpec("bad", bad, LagSeconds(600)))
    clock.advance(5)
    e.insert("events", kv((5, "x", 5.0))) // v=5 → division by zero in delta
    spark.conf.set("spark.sql.ansi.enabled", "true")
    try {
      for (i <- 1 to 3) {
        clock.advance(5)
        intercept[Exception](e.refresh("bad", clock.nowSeconds))
      }
      assert(e.dtState("bad").suspended)
      clock.advance(5)
      intercept[IllegalArgumentException](e.refresh("bad", clock.nowSeconds))
      e.resume("bad")
      assert(!e.dtState("bad").suspended)
    } finally spark.conf.set("spark.sql.ansi.enabled", "false")
  }

  test("deleting rows not present in a base table is rejected") {
    val (e, _) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    intercept[IllegalArgumentException](e.dml("events", kv(), kv((9, "q", 9.9))))
  }

  test("successful refresh resets the failure counter") {
    val (e, clock) = newEngine(failureThreshold = 3)
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    e.dtState("agg").consecutiveFailures = 2
    clock.advance(5)
    e.refresh("agg", clock.nowSeconds)
    assert(e.dtState("agg").consecutiveFailures == 0)
  }

  test("DT reading another DT stays incremental end to end") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0), (2, "b", 2.0)))
    e.createDynamicTable(DtSpec("filtered", Filter(Scan("events"), "v > 0"), LagSeconds(600)))
    e.createDynamicTable(DtSpec("agg", Aggregate(Scan("filtered"), Seq("cat"), Seq("s" -> "sum(v)")), LagSeconds(600)))
    clock.advance(10)
    e.insert("events", kv((3, "a", 10.0)))
    clock.advance(10)
    val ts = clock.nowSeconds
    val r1 = e.refresh("filtered", ts)
    val r2 = e.refresh("agg", ts)
    assert(r1.action == IncrementalRefresh && r2.action == IncrementalRefresh)
    assert(e.read("agg").where("cat = 'a'").collect().head.getAs[Double]("s") == 11.0)
  }

  test("refresh timestamps must strictly advance") {
    val (e, clock) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    intercept[IllegalArgumentException](e.refresh("agg", e.dataTimestamp("agg")))
  }

  test("dropping and recreating a DT works") {
    val (e, _) = newEngine()
    e.createBaseTable("events", kv((1, "a", 1.0)))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    e.dropDynamicTable("agg")
    intercept[NoSuchElementException](e.dtState("agg"))
    e.createDynamicTable(DtSpec("agg", aggQuery, LagSeconds(600)))
    assert(e.read("agg").count() == 1)
  }
}
