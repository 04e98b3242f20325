package repro.sched

import repro.ReproSpec
import repro.core._

/** The §5.2 policy driving the real engine end to end. */
class EngineSchedulerSpec extends ReproSpec {
  private lazy val testImplicits = spark.implicits
  import testImplicits._

  test("scheduled refreshes keep a DT chain consistent and aligned") {
    val (e, clock) = newEngine(start = 0)
    e.createBaseTable("events", Seq(("a", 1.0), ("b", 2.0)).toDF("k", "v"))
    e.createDynamicTable(DtSpec("filtered", Filter(Scan("events"), "v > 0"), LagSeconds(96)))
    e.createDynamicTable(DtSpec("agg", Aggregate(Scan("filtered"), Seq("k"), Seq("s" -> "sum(v)")), LagSeconds(600)))
    val sched = new EngineScheduler(e, clock)
    assert(sched.periods == Map("filtered" -> Some(96L), "agg" -> Some(384L)))

    e.insert("events", Seq(("a", 10.0)).toDF("k", "v"))
    val results = sched.advanceTo(800)
    // filtered ticks at 96..768 (8), agg at 384 and 768 (2)
    assert(results.count(_.dt == "filtered") == 8)
    assert(results.count(_.dt == "agg") == 2)
    // alignment: agg's data timestamps are also filtered's
    val fTs = results.filter(_.dt == "filtered").map(_.dataTs).toSet
    assert(results.filter(_.dt == "agg").forall(r => fTs.contains(r.dataTs)))
    assertSameRows(e.read("agg"),
      Eval.snapshot(Aggregate(Filter(Scan("events"), "v > 0"), Seq("k"), Seq("s" -> "sum(v)")),
        _ => e.read("events")))
  }

  test("quiet periods produce NO_DATA refreshes only") {
    val (e, clock) = newEngine(start = 0)
    e.createBaseTable("events", Seq(("a", 1.0)).toDF("k", "v"))
    e.createDynamicTable(DtSpec("copy", Filter(Scan("events"), "v > 0"), LagSeconds(96)))
    val sched = new EngineScheduler(e, clock)
    sched.advanceTo(500) // initial state, no changes after init
    val results = sched.advanceTo(1000)
    assert(results.nonEmpty && results.forall(_.action == NoData))
  }

  test("DOWNSTREAM-lag DT refreshes at its consumer's period") {
    val (e, clock) = newEngine(start = 0)
    e.createBaseTable("events", Seq(("a", 1.0)).toDF("k", "v"))
    e.createDynamicTable(DtSpec("mid", Filter(Scan("events"), "v > 0"), DownstreamLag))
    e.createDynamicTable(DtSpec("out", Filter(Scan("mid"), "v > 0"), LagSeconds(384)))
    val sched = new EngineScheduler(e, clock)
    assert(sched.periods("mid") == Some(384L))
    val results = sched.advanceTo(400)
    assert(results.map(_.dt) == Seq("mid", "out"))
    assert(results.map(_.dataTs).distinct.size == 1)
  }

  test("changes land in the DT within one period (lag bound holds)") {
    val (e, clock) = newEngine(start = 0)
    e.createBaseTable("events", Seq(("a", 1.0)).toDF("k", "v"))
    e.createDynamicTable(DtSpec("copy", Filter(Scan("events"), "v > 0"), LagSeconds(96)))
    val sched = new EngineScheduler(e, clock)
    sched.advanceTo(100)
    e.insert("events", Seq(("z", 9.0)).toDF("k", "v")) // at t=100
    sched.advanceTo(200) // tick at 192 must pick it up
    assert(e.read("copy").where("k = 'z'").count() == 1)
    assert(e.dataTimestamp("copy") == 192L)
  }
}
