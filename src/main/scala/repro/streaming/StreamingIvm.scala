package repro.streaming

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** A pure Structured Streaming maintenance of an aggregate derived table,
  * used as the parity baseline for T6: the same logical view maintained
  * (a) by full recompute, (b) by our IVM engine, and (c) by Spark's
  * native stateful aggregation with event-time watermarking.
  *
  * This is the "classic streaming system" side of the paper's impedance
  * argument: correct, low-latency, but the update semantics (when state
  * is emitted, when late data is dropped) are governed by watermarks and
  * output modes rather than by delayed view semantics.
  */
object StreamingIvm {

  /** Windowed, keyed aggregation with a watermark. `aggs` are (alias,
    * aggregate-expression) pairs, e.g. ("revenue", "sum(amount)").
    * Returns a streaming DataFrame with columns: window_start, keys…,
    * aggs… — suitable for `outputMode("update")` into a memory sink.
    */
  def windowedAggregate(
      input: DataFrame,
      eventTimeCol: String,
      watermarkDelay: String,
      windowDuration: String,
      keyCols: Seq[String],
      aggs: Seq[(String, String)],
  ): DataFrame = {
    val grouped = input
      .withWatermark(eventTimeCol, watermarkDelay)
      .groupBy(window(col(eventTimeCol), windowDuration) +: keyCols.map(col): _*)
    val aggCols = aggs.map { case (a, e) => expr(e).as(a) }
    grouped
      .agg(aggCols.head, aggCols.tail: _*)
      .select(col("window.start").as("window_start") +: (keyCols.map(col) ++ aggs.map(a => col(a._1))): _*)
  }

  /** Unwindowed keyed aggregation (complete-mode parity target). */
  def keyedAggregate(input: DataFrame, keyCols: Seq[String], aggs: Seq[(String, String)]): DataFrame = {
    val aggCols = aggs.map { case (a, e) => expr(e).as(a) }
    input.groupBy(keyCols.map(col): _*).agg(aggCols.head, aggCols.tail: _*)
  }
}
