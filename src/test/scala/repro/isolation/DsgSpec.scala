package repro.isolation

import org.scalatest.funsuite.AnyFunSuite

/** Each extended dependency rule of §4, in isolation. */
class DsgSpec extends AnyFunSuite {
  import Dsg._

  test("prior wr: read of an installed version") {
    val h = History(Seq(Write(1, "x", 1), Read(2, "x", 1)), Set(1, 2))
    assert(edges(h).contains(Edge(1, 2, WR)))
  }

  test("extended wr: read of a derived value depends on the source writer") {
    val h = History(
      Seq(Write(1, "x", 1), Derive(3, "y", 1, Seq(("x", 1))), Read(2, "y", 1)),
      Set(1, 2, 3))
    assert(edges(h).contains(Edge(1, 2, WR)))
    // the deriving transaction itself gets no edge — pure computation
    assert(!edges(h).exists(e => e.from == 3 || e.to == 3))
  }

  test("extended wr crosses multi-step derivation chains") {
    val h = History(
      Seq(Write(1, "x", 1), Derive(4, "y", 1, Seq(("x", 1))), Derive(5, "z", 1, Seq(("y", 1))), Read(2, "z", 1)),
      Set(1, 2, 4, 5))
    assert(edges(h).contains(Edge(1, 2, WR)))
  }

  test("prior rw: reader of superseded version anti-depends on overwriter") {
    val h = History(Seq(Write(1, "x", 1), Read(3, "x", 1), Write(2, "x", 2)), Set(1, 2, 3))
    assert(edges(h).contains(Edge(3, 2, RW)))
  }

  test("extended rw: reading a value derived from a superseded version") {
    val h = History(
      Seq(Write(1, "x", 1), Derive(4, "y", 1, Seq(("x", 1))), Read(3, "y", 1), Write(2, "x", 2)),
      Set(1, 2, 3, 4))
    assert(edges(h).contains(Edge(3, 2, RW)),
      "T3 read y1 which derives from x1; T2 installed x2 — T3 must anti-depend on T2")
  }

  test("prior ww: consecutive installed versions") {
    val h = History(Seq(Write(1, "x", 1), Write(2, "x", 2)), Set(1, 2))
    assert(edges(h).contains(Edge(1, 2, WW)))
  }

  test("extended ww via consecutive derived versions") {
    val h = History(
      Seq(
        Write(1, "x", 1), Write(2, "u", 1),
        Derive(5, "z", 1, Seq(("x", 1))),
        Derive(6, "z", 2, Seq(("u", 1))),
      ),
      Set(1, 2, 5, 6))
    assert(edges(h).contains(Edge(1, 2, WW)),
      "consecutive z versions derive from x1 (T1) and u1 (T2) → T1 ww T2")
  }

  test("edges only connect committed transactions") {
    val h = History(Seq(Write(1, "x", 1), Read(2, "x", 1)), committed = Set(2), aborted = Set(1))
    assert(edges(h).isEmpty)
  }

  test("cycle detection honours the label filter") {
    val es = Set(Edge(1, 2, WW), Edge(2, 1, RW))
    assert(!hasCycle(es, Set(WW)))
    assert(hasCycle(es, Set(WW, RW)))
    assert(hasSingleAntiCycle(es))
  }

  test("hasSingleAntiCycle requires a non-anti return path") {
    val es = Set(Edge(1, 2, RW), Edge(2, 1, RW))
    assert(!hasSingleAntiCycle(es), "two anti-dependencies is G2, not G-single")
  }
}
