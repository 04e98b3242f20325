package repro.bench

import repro.SparkSpec
import repro.exp.T6StreamingParity

/** T6 — DT micro-batch maintenance vs native Structured Streaming. */
class T6StreamingBench extends SparkSpec {

  test("T6: three maintenance strategies agree; per-batch latency reported") {
    val r = T6StreamingParity.run(spark, nBatches = 5, rowsPerBatch = 2000)
    println(r.table)
    assert(r.engineMatchesRecompute, "DT engine must equal full recompute")
    assert(r.engineMatchesStreaming, "DT engine must equal structured-streaming aggregation")
    assert(r.batches.count(_.action == "IncrementalRefresh") >= 4,
      "micro-batches should refresh incrementally")
    assert(r.totalRows == 5L * 2000L)
  }
}
