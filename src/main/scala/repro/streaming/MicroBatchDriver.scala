package repro.streaming

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.streaming.StreamingQuery
import repro.core.{Engine, RefreshResult}
import repro.sched.SimClock
import scala.collection.mutable

/** Bridges Spark Structured Streaming into the dynamic-table engine.
  *
  * Dynamic Tables implement micro-batch processing (§5, citing
  * Discretized Streams [33]); the repro hint maps them onto Structured
  * Streaming. This driver consumes a streaming DataFrame with
  * `foreachBatch`: every micro-batch is committed as a base-table DML
  * transaction, the (virtual) clock advances by one batch period, and the
  * DT graph is refreshed at the new data timestamp — so each micro-batch
  * is exactly one refresh interval.
  */
final class MicroBatchDriver(
    engine: Engine,
    clock: SimClock,
    targetTable: String,
    batchPeriodSeconds: Long = 48L,
) {
  private val results = mutable.ArrayBuffer.empty[RefreshResult]

  /** Refresh outcomes of all micro-batches processed so far. */
  def refreshResults: Seq[RefreshResult] = synchronized(results.toSeq)

  /** Start consuming `stream` (an append-only streaming DataFrame whose
    * schema matches `targetTable`).
    */
  def attach(stream: DataFrame): StreamingQuery =
    stream.writeStream
      .outputMode("append")
      .foreachBatch { (batch: DataFrame, _: Long) =>
        // Pin the micro-batch contents: the batch plan is only valid
        // within this callback, but versions must outlive it.
        val rows: java.util.List[Row] = batch.collectAsList()
        val pinned = batch.sparkSession.createDataFrame(rows, batch.schema)
        synchronized {
          if (!pinned.isEmpty) engine.insert(targetTable, pinned)
          clock.advance(batchPeriodSeconds)
          results ++= engine.refreshGraphAt(clock.nowSeconds)
        }
        ()
      }
      .start()
}
