package repro.txn

import org.scalatest.funsuite.AnyFunSuite

/** Hybrid Logical Clock (§5.3): total order, monotonicity, merge rules. */
class HlcSpec extends AnyFunSuite {

  test("timestamps order by l then c") {
    assert(Hlc.Timestamp(1, 0) < Hlc.Timestamp(2, 0))
    assert(Hlc.Timestamp(1, 1) < Hlc.Timestamp(1, 2))
    assert(Hlc.Timestamp(2, 0) > Hlc.Timestamp(1, 99))
  }

  test("now() strictly increases even when physical time is frozen") {
    val c = new HlcClock(() => 100L)
    val a = c.now(); val b = c.now(); val d = c.now()
    assert(a < b && b < d)
    assert(b.l == 100L && b.c > a.c)
  }

  test("now() follows physical time when it advances") {
    var t = 100L
    val c = new HlcClock(() => t)
    val a = c.now()
    t = 200L
    val b = c.now()
    assert(b.l == 200L && b.c == 0 && a < b)
  }

  test("now() tolerates physical-clock regression") {
    var t = 100L
    val c = new HlcClock(() => t)
    c.now()
    t = 50L // regress
    val b = c.now()
    assert(b.l == 100L, "logical component must not go backwards")
  }

  test("update() moves past a remote timestamp") {
    val c = new HlcClock(() => 100L)
    val merged = c.update(Hlc.Timestamp(500L, 3))
    assert(merged.l == 500L && merged.c == 4)
    assert(c.now() > merged)
  }

  test("update() with stale remote keeps local dominance") {
    var t = 100L
    val c = new HlcClock(() => t)
    val local = c.now()
    val merged = c.update(Hlc.Timestamp(10L, 0))
    assert(merged > local)
  }

  test("property: any interleaving of now/update is strictly monotone") {
    for (seed <- 1 to 100) {
      val rng = new scala.util.Random(seed)
      var t = 0L
      val c = new HlcClock(() => t)
      var prev = Hlc.Zero
      for (_ <- 1 to 50) {
        t += rng.between(-2L, 5L)
        val next = if (rng.nextBoolean()) c.now() else c.update(Hlc.Timestamp(rng.between(0L, 100L), rng.nextInt(3)))
        assert(next > prev)
        prev = next
      }
    }
  }
}
