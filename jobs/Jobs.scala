package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** Shared SparkSession construction for spark-submit entrypoints.
  * Each job regenerates one evaluation table (see EXPERIMENTS.md).
  */
object JobSession {
  def create(name: String): SparkSession = SparkSession.builder
    .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
    .appName(name)
    .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .config("spark.ui.enabled", "false")
    .getOrCreate()
}

/** T1 — refresh-action mix (§6.3); pure simulation, Spark not required. */
object T1RefreshMixJob {
  def main(args: Array[String]): Unit = {
    val horizon = args.headOption.map(_.toLong).getOrElse(86_400L)
    println(T1RefreshMix.run(horizonSeconds = horizon).table)
  }
}

/** T2 — incremental vs full refresh cost (§3.3.2). arg0 = scale factor. */
object T2IncrementalCostJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = JobSession.create("t2-incremental-cost")
    try T2IncrementalCost.run(spark, sf).foreach(r => println(r.table))
    finally spark.stop()
  }
}

/** T3 — scheduling heuristic and overload behaviour (§5.2, §3.3.3). */
object T3SchedulingJob {
  def main(args: Array[String]): Unit = {
    val r = T3Scheduling.run()
    println(r.chainTable)
    println(r.overloadTable)
  }
}

/** T4 — operator coverage and speedup (§3.3.2). arg0 = base rows. */
object T4OperatorJob {
  def main(args: Array[String]): Unit = {
    val rows = args.headOption.map(_.toLong).getOrElse(100_000L)
    val spark = JobSession.create("t4-operator-coverage")
    try println(T4OperatorCoverage.run(spark, rows).table)
    finally spark.stop()
  }
}

/** T5 — isolation phenomena (§4). arg0 = #randomized histories. */
object T5IsolationJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(500)
    val r = T5Isolation.run(randomHistories = n)
    println(r.table)
    println(r.randomTable)
  }
}

/** T6 — streaming parity (repro-band mapping). arg0 = #micro-batches. */
object T6StreamingJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(5)
    val spark = JobSession.create("t6-streaming-parity")
    try println(T6StreamingParity.run(spark, nBatches = n).table)
    finally spark.stop()
  }
}

/** Regenerate every table in one run. */
object AllTablesJob {
  def main(args: Array[String]): Unit = {
    println(T1RefreshMix.run().table)
    val r3 = T3Scheduling.run(); println(r3.chainTable); println(r3.overloadTable)
    val r5 = T5Isolation.run(); println(r5.table); println(r5.randomTable)
    val spark = JobSession.create("all-tables")
    try {
      T2IncrementalCost.run(spark, sys.env.getOrElse("REPRO_SF", "0.1").toDouble)
        .foreach(r => println(r.table))
      println(T4OperatorCoverage.run(spark).table)
      println(T6StreamingParity.run(spark).table)
    } finally spark.stop()
  }
}
