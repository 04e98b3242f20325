package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.T5Isolation

/** T5 — isolation phenomena under persisted vs delayed view semantics (§4). */
class T5IsolationBench extends AnyFunSuite {

  test("T5: Figures 1-2 and randomized stale-refresh histories") {
    val r = T5Isolation.run(randomHistories = 500)
    println(r.table)
    println(r.randomTable)

    val fig1 = r.rows.head
    assert(fig1.phenomena == "none" && fig1.level.startsWith("PL-3"),
      "persisted table semantics must mask the read skew (Figure 1)")
    val fig2 = r.rows(1)
    assert(fig2.phenomena.contains("G2") && fig2.phenomena.contains("G-single"),
      "DVS must expose the read skew (Figure 2)")
    val consistent = r.rows(2)
    assert(consistent.level.startsWith("PL-3"), "aligned read shows no anomaly")

    // ground truth: the DVS model flags exactly the histories with true skew
    assert(r.random.dvsExact, "DVS detection must match application-level ground truth")
    assert(r.random.dvsFlagged == r.random.trueSkew)
    assert(r.random.trueSkew > 0 && r.random.trueSkew < r.random.histories)
  }
}
