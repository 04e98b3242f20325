package repro.exp

import repro.sched.{SimNode, SimScheduler}
import scala.util.Random

/** T1 — refresh-action mix and changed-rows distribution (§6.3).
  *
  * Paper claims reproduced in shape:
  *   - >90% of refreshes are NO_DATA (target lag below data refresh rate);
  *   - 67% of incremental refreshes change <1% of the DT; 21% change >10%.
  *
  * Workload substitution: a synthetic fleet of DTs whose target-lag
  * distribution follows the paper's Figure 5 buckets (~20% under 5 min,
  * ~25% at 16 h or more, 55% between) over sources with independent
  * update cadences (batch data loads every 15 min … 1 day) and batch
  * sizes that are mostly small relative to the DT (dimension trickle)
  * with a bursty tail (fact reloads).
  */
object T1RefreshMix {

  final case class Result(
      totalRefreshes: Long,
      noDataFraction: Double,
      incrementalRefreshes: Long,
      fracUnder1pct: Double,
      frac1to10pct: Double,
      fracOver10pct: Double,
      skips: Long,
  ) {
    def table: String = Tables.render(
      "T1 Refresh-action mix (paper §6.3)",
      Seq("metric", "paper", "measured"),
      Seq(
        Seq("refreshes that are NO_DATA", ">90%", Tables.pct(noDataFraction)),
        Seq("incremental refreshes changing <1% of DT", "67%", Tables.pct(fracUnder1pct)),
        Seq("incremental refreshes changing 1-10%", "~12%", Tables.pct(frac1to10pct)),
        Seq("incremental refreshes changing >10%", "21%", Tables.pct(fracOver10pct)),
      ),
      Seq(s"$totalRefreshes refreshes over the horizon, $incrementalRefreshes incremental, $skips skips"),
    )
  }

  /** Figure-5-shaped target lag buckets: (lag seconds, #DTs). */
  val lagBuckets: Seq[(Long, Int)] = Seq(
    60L -> 10, 300L -> 14, // < 5 min: 20%
    1800L -> 20, 3600L -> 16, 14400L -> 20, 28800L -> 15, // middle: 55% (approx)
    57600L -> 13, 86400L -> 12, // >= 16 h: 25%
  )

  val DtSizeRows: Long = 100_000L

  def run(seed: Long = 42L, horizonSeconds: Long = 86_400L): Result = {
    val rng = new Random(seed)

    final case class Src(updatePeriod: Long, batchRows: Long)
    def drawSrc(): Src = {
      val u = rng.nextInt(100) match {
        case x if x < 25 => 900L
        case x if x < 65 => 3600L
        case x if x < 85 => 14_400L
        case _           => 86_400L
      }
      // mostly-trickle with a bursty tail: ~65% of changed-data batches are
      // <1% of the DT, ~15% land in 1-10%, ~20% exceed 10%.
      val b = rng.nextInt(100) match {
        case x if x < 65 => 200L
        case x if x < 80 => 2_000L
        case _           => 15_000L
      }
      Src(u, b)
    }

    val nodes = Seq.newBuilder[SimNode]
    val srcOf = scala.collection.mutable.Map.empty[String, Src]
    var i = 0
    for ((lag, count) <- lagBuckets; _ <- 1 to count) {
      i += 1
      val name = s"dt$i"
      srcOf(s"src$i") = drawSrc()
      nodes += SimNode(name, baseSources = Seq(s"src$i"), targetLag = Some(lag),
        warehouse = s"wh$i", fixedCost = 2.0, varCostPerRow = 1e-4)
    }

    def sourceChanges(s: String, t0: Long, t1: Long): Long = {
      val src = srcOf(s)
      (t1 / src.updatePeriod - t0 / src.updatePeriod) * src.batchRows
    }

    val results = new SimScheduler(nodes.result(), sourceChanges).run(horizonSeconds)

    val records = results.values.flatMap(_.records).toSeq
    val noData = records.count(_.action == "NO_DATA").toLong
    val incr = records.filter(_.action == "INCREMENTAL")
    val fracs = incr.map(_.changedRows.toDouble / DtSizeRows)
    def share(p: Double => Boolean) = if (fracs.isEmpty) 0.0 else fracs.count(p).toDouble / fracs.size
    Result(
      totalRefreshes = records.size.toLong,
      noDataFraction = if (records.isEmpty) 0.0 else noData.toDouble / records.size,
      incrementalRefreshes = incr.size.toLong,
      fracUnder1pct = share(_ < 0.01),
      frac1to10pct = share(f => f >= 0.01 && f <= 0.10),
      fracOver10pct = share(_ > 0.10),
      skips = results.values.map(_.skippedDataTs.size.toLong).sum,
    )
  }
}
