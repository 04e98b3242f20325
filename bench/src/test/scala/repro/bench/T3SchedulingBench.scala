package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.T3Scheduling

/** T3 — scheduling heuristic (§5.2) and graceful degradation (§3.3.3). */
class T3SchedulingBench extends AnyFunSuite {

  test("T3: chain stays within target lag with aligned timestamps; overload sheds cost via skips") {
    val r = T3Scheduling.run()
    println(r.chainTable)
    println(r.overloadTable)

    // T3a: every DT in the chain meets its target and aligns with upstream.
    assert(r.chain.forall(_.withinTarget), s"lag exceeded: ${r.chain}")
    assert(r.chain.forall(_.aligned), "data timestamps must align along the chain")
    // periods are canonical and non-decreasing downstream
    assert(r.chain.map(_.period) == r.chain.map(_.period).sorted)
    r.chain.foreach(c => assert(c.period % 48 == 0 && isPowerOfTwoMultiple(c.period)))

    // T3b: once cost exceeds the period, skips appear and grow with cost,
    // while the DT keeps advancing and total fixed cost stays bounded.
    val overloaded = r.overload.filter(_.fixedCost > 96)
    assert(overloaded.forall(_.skips > 0))
    assert(r.overload.map(_.skips) == r.overload.map(_.skips).sorted, "skips grow with refresh cost")
    overloaded.foreach { o =>
      assert(o.lastDataTs >= o.horizon - 8 * 96, s"progress stalled: $o")
      assert(o.fixedCostSpent < o.fixedCostIfNoSkips, "skips must shed fixed cost")
    }
  }

  private def isPowerOfTwoMultiple(p: Long): Boolean = {
    var x = p / 48
    while (x % 2 == 0) x /= 2
    x == 1
  }
}
