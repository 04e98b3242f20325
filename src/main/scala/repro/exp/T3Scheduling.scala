package repro.exp

import repro.sched._

/** T3 — scheduling heuristic behaviour (§5.2, §3.3.3).
  *
  * Reproduced claims:
  *   - refresh periods are drawn from 48·2^n and can be substantially
  *     smaller than the target lag;
  *   - data timestamps align across DTs with different target lags, so
  *     downstream refreshes always find exact upstream versions;
  *   - with adequate resources, peak lag (= p + w + d) stays within the
  *     target for every DT in a chain;
  *   - under overload the scheduler skips refreshes, sheds their fixed
  *     cost, and keeps advancing (graceful degradation), with DVS intact
  *     (the next refresh covers the skipped interval).
  */
object T3Scheduling {

  final case class ChainRow(name: String, targetLag: Long, period: Long,
                            maxPeak: Long, withinTarget: Boolean, aligned: Boolean)
  final case class OverloadRow(fixedCost: Long, refreshes: Int, skips: Int,
                               lastDataTs: Long, horizon: Long, fixedCostSpent: Long, fixedCostIfNoSkips: Long)

  final case class Result(chain: Seq[ChainRow], overload: Seq[OverloadRow]) {
    def chainTable: String = Tables.render(
      "T3a Chain of DTs: periods, alignment, lag vs target (§5.2)",
      Seq("dt", "target lag", "period 48*2^n", "max peak lag", "within target", "ts aligned upstream"),
      chain.map(r => Seq(r.name, s"${r.targetLag}s", s"${r.period}s", s"${r.maxPeak}s",
        r.withinTarget.toString, r.aligned.toString)),
    )
    def overloadTable: String = Tables.render(
      "T3b Overload: skips shed fixed cost, progress continues (§3.3.3)",
      Seq("refresh cost", "refreshes", "skips", "final data ts / horizon", "fixed cost spent", "if no skips"),
      overload.map(r => Seq(s"${r.fixedCost}s", r.refreshes.toString, r.skips.toString,
        s"${r.lastDataTs}/${r.horizon}", s"${r.fixedCostSpent}s", s"${r.fixedCostIfNoSkips}s")),
    )
  }

  def run(horizon: Long = 43_200L): Result = {
    // --- chain: src(5 min) -> mid(30 min) -> sink(1 h), steady trickle ---
    val chainNodes = Seq(
      SimNode("src", baseSources = Seq("raw"), targetLag = Some(300L), fixedCost = 8, varCostPerRow = 1e-3),
      SimNode("mid", upstream = Seq("src"), targetLag = Some(1800L), fixedCost = 8, varCostPerRow = 1e-3, warehouse = "wh2"),
      SimNode("sink", upstream = Seq("mid"), targetLag = Some(3600L), fixedCost = 8, varCostPerRow = 1e-3, warehouse = "wh3"),
    )
    val sched = new SimScheduler(chainNodes, (_, t0, t1) => (t1 / 60 - t0 / 60) * 20)
    val res = sched.run(horizon)
    val tsOf = res.view.mapValues(_.records.map(_.dataTs).toSet).toMap
    val upstreamOf = Map("src" -> None, "mid" -> Some("src"), "sink" -> Some("mid"))
    val chain = chainNodes.map { n =>
      val r = res(n.name)
      val aligned = upstreamOf(n.name).forall(u => r.records.map(_.dataTs).forall(tsOf(u).contains))
      ChainRow(n.name, n.targetLag.get, r.period.get, r.sawtooth.maxPeak,
        withinTarget = r.sawtooth.maxPeak <= n.targetLag.get, aligned = aligned)
    }

    // --- overload: same DT at increasing refresh cost vs a 96 s period ---
    val overload = Seq(20L, 80L, 150L, 300L).map { cost =>
      val n = SimNode("x", baseSources = Seq("raw"), targetLag = Some(96L), fixedCost = cost.toDouble)
      val r = new SimScheduler(Seq(n), (_, t0, t1) => t1 - t0).run(9600)("x")
      val ran = r.records.count(_.action != "NO_DATA")
      OverloadRow(cost, r.records.size, r.skippedDataTs.size, r.records.lastOption.map(_.dataTs).getOrElse(0L),
        9600, ran * cost, (9600 / 96) * cost)
    }
    Result(chain, overload)
  }
}
