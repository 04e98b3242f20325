package repro.streaming

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.functions._
import repro.ReproSpec
import repro.core._
import repro.sched.SimClock

/** Structured Streaming integration (repro hint): micro-batches feed the
  * DT engine, and Spark's native stateful aggregation with watermarking
  * maintains the same derived table for parity.
  */
/** Top-level so Catalyst can generate an encoder for it. */
final case class StreamEvent(k: String, v: Double, ts: java.sql.Timestamp)

class StreamingSpec extends ReproSpec {
  private lazy val testImplicits = spark.implicits
  import testImplicits._

  private def ev(k: String, v: Double, sec: Long) = StreamEvent(k, v, new java.sql.Timestamp(sec * 1000))

  test("MicroBatchDriver maintains a DT graph from a stream, one refresh interval per micro-batch") {
    implicit val sqlCtx = spark.sqlContext
    val clock = new SimClock(1000)
    val engine = new Engine(spark, clock)
    engine.createBaseTable("events", Seq.empty[(String, Double)].toDF("k", "v"))
    val q = Aggregate(Scan("events"), Seq("k"), Seq("n" -> "count(1)", "s" -> "sum(v)"))
    engine.createDynamicTable(DtSpec("agg", q, LagSeconds(60)))

    val stream = MemoryStream[(String, Double)]
    val driver = new MicroBatchDriver(engine, clock, "events")
    val query = driver.attach(stream.toDF().toDF("k", "v"))
    try {
      stream.addData(("a", 1.0), ("b", 2.0))
      query.processAllAvailable()
      stream.addData(("a", 3.0))
      query.processAllAvailable()
    } finally query.stop()

    // every micro-batch produced an incremental refresh at a new data ts
    val incs = driver.refreshResults.filter(_.dt == "agg")
    assert(incs.nonEmpty && incs.forall(_.action == IncrementalRefresh))
    assertSameRows(engine.read("agg"), Eval.snapshot(q, _ => engine.read("events")))
    assert(engine.read("agg").where("k = 'a'").collect().head.getAs[Double]("s") == 4.0)
  }

  test("micro-batches with no data produce NO_DATA refreshes") {
    implicit val sqlCtx = spark.sqlContext
    val clock = new SimClock(1000)
    val engine = new Engine(spark, clock)
    engine.createBaseTable("events", Seq(("a", 1.0)).toDF("k", "v"))
    engine.createDynamicTable(DtSpec("copy", Filter(Scan("events"), "v > 0"), LagSeconds(60)))
    clock.advance(48)
    val r = engine.refreshGraphAt(clock.nowSeconds)
    assert(r.map(_.action) == Seq(NoData))
  }

  test("Structured Streaming watermark aggregation matches the DT engine result") {
    implicit val sqlCtx = spark.sqlContext
    // --- native Structured Streaming side ---
    val stream = MemoryStream[StreamEvent]
    val aggStream = StreamingIvm.windowedAggregate(
      stream.toDF(), "ts", "10 seconds", "60 seconds", Seq("k"),
      Seq("n" -> "count(1)", "s" -> "sum(v)"))
    val query = aggStream.writeStream.format("memory").queryName("ss_agg").outputMode("update").start()

    // --- DT engine side over the same events ---
    val clock = new SimClock(0)
    val engine = new Engine(spark, clock)
    val events = Seq(ev("a", 1.0, 10), ev("a", 2.0, 15), ev("b", 5.0, 70), ev("a", 4.0, 75))
    try {
      stream.addData(events: _*)
      query.processAllAvailable()
    } finally query.stop()

    engine.createBaseTable("events", events.toDF())
    val q = Aggregate(
      Project(Scan("events"), Seq(
        "window_start" -> "timestamp_seconds(floor(unix_timestamp(ts) / 60) * 60)",
        "k" -> "k", "v" -> "v")),
      Seq("window_start", "k"), Seq("n" -> "count(1)", "s" -> "sum(v)"))
    engine.createDynamicTable(DtSpec("agg", q, LagSeconds(60)))

    // memory sink in update mode: take the latest row per (window, key)
    val ss = spark.table("ss_agg")
      .withColumn("rn", row_number().over(
        org.apache.spark.sql.expressions.Window.partitionBy("window_start", "k").orderBy(monotonically_increasing_id().desc)))
      .where("rn = 1").drop("rn")
    assertSameRows(ss, engine.read("agg"), "structured-streaming vs DT engine")
  }

  test("late data beyond the watermark is the DVS difference: the DT keeps it") {
    implicit val sqlCtx = spark.sqlContext
    val clock = new SimClock(1000)
    val engine = new Engine(spark, clock)
    engine.createBaseTable("events", Seq(ev("a", 1.0, 10)).toDF())
    val q = Aggregate(Scan("events"), Seq("k"), Seq("s" -> "sum(v)"))
    engine.createDynamicTable(DtSpec("agg", q, LagSeconds(60)))
    // an arbitrarily late event still lands in the next refresh interval —
    // DVS has no notion of "too late", unlike watermarked streaming
    clock.advance(48)
    engine.insert("events", Seq(ev("a", 9.0, 1)).toDF()) // event time long past
    clock.advance(48)
    engine.refreshGraphAt(clock.nowSeconds)
    assert(engine.read("agg").collect().head.getAs[Double]("s") == 10.0)
  }
}
