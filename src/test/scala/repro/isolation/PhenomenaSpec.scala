package repro.isolation

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The paper's §4 examples and theorems: persisted-table semantics hides
  * read skew (Figure 1); delayed view semantics with derivations reveals
  * it (Figure 2); Theorem 1 (transaction invariance) and Corollary 2
  * (encapsulation) hold on randomized histories.
  */
class PhenomenaSpec extends AnyFunSuite {

  /** Figure 1: refreshes modelled as ordinary transactions (persisted
    * table semantics). T1,T2 write x1,x2; refresh T3 reads x1 and writes
    * y3; refresh T4 reads x2 and writes y4; T5 reads y3 and x2.
    */
  private val figure1 = History(
    ops = Seq(
      Write(1, "x", 1),
      Write(2, "x", 2),
      Read(3, "x", 1), Write(3, "y", 3),
      Read(4, "x", 2), Write(4, "y", 4),
      Read(5, "y", 3), Read(5, "x", 2),
    ),
    committed = Set(1, 2, 3, 4, 5),
    versionOrder = Map("x" -> Seq(1, 2), "y" -> Seq(3, 4)),
  )

  /** Figure 2: the same events under delayed view semantics — refreshes
    * are derivations.
    */
  private val figure2 = History(
    ops = Seq(
      Write(1, "x", 1),
      Write(2, "x", 2),
      Derive(3, "y", 3, Seq(("x", 1))),
      Derive(4, "y", 4, Seq(("x", 2))),
      Read(5, "y", 3), Read(5, "x", 2),
    ),
    committed = Set(1, 2, 3, 4, 5),
    versionOrder = Map("x" -> Seq(1, 2), "y" -> Seq(3, 4)),
  )

  test("Figure 1: persisted table semantics is serializable — read skew is masked") {
    val r = Phenomena.analyze(figure1)
    assert(!r.g2 && !r.g1c && !r.g0, s"expected no cycles, got ${r.present}")
    assert(r.strongestLevel == "PL-3 (serializable)")
  }

  test("Figure 2: derivations expose the read skew as G2 / G-single") {
    val r = Phenomena.analyze(figure2)
    assert(r.g2, "anti-dependency cycle must appear")
    assert(r.gSingle, "the cycle has exactly one anti-dependency (G-single)")
    assert(!r.g1c && !r.g0, "no write/read-only cycle")
  }

  test("Figure 2 edge structure matches the paper: T2 → T5 → T2") {
    val es = Dsg.edges(figure2)
    assert(es.contains(Dsg.Edge(2, 5, Dsg.WR)), "T5 reads x2 installed by T2")
    assert(es.contains(Dsg.Edge(5, 2, Dsg.RW)), "T5 read y3 (derives from x1); T2 installed x2")
    assert(es.contains(Dsg.Edge(1, 5, Dsg.WR)), "T5 reads y3 which derives from x1")
    // the refresh transactions vanish from the DSG
    assert(!es.exists(e => e.from == 3 || e.to == 3 || e.from == 4 || e.to == 4))
  }

  test("a consistent read (y4 with x2) shows no anomaly under DVS") {
    val h = figure2.copy(ops = figure2.ops.map {
      case Read(5, "y", 3) => Read(5, "y", 4)
      case op              => op
    })
    val r = Phenomena.analyze(h)
    assert(!r.g2 && r.strongestLevel == "PL-3 (serializable)")
  }

  test("G0: write cycle") {
    val h = History(
      Seq(Write(1, "x", 1), Write(2, "x", 2), Write(2, "y", 1), Write(1, "y", 2)),
      Set(1, 2),
      versionOrder = Map("x" -> Seq(1, 2), "y" -> Seq(1, 2)))
    val r = Phenomena.analyze(h)
    assert(r.g0 && r.strongestLevel == "none")
  }

  test("G1a: aborted read, including via derivation") {
    val direct = History(Seq(Write(1, "x", 1), Read(2, "x", 1)), committed = Set(2), aborted = Set(1))
    assert(Phenomena.analyze(direct).g1a)
    val viaDerivation = History(
      Seq(Write(1, "x", 1), Derive(3, "y", 1, Seq(("x", 1))), Read(2, "y", 1)),
      committed = Set(2, 3), aborted = Set(1))
    assert(Phenomena.analyze(viaDerivation).g1a, "reading a value derived from an aborted write is G1a")
  }

  test("G1b: intermediate read, including via derivation") {
    val direct = History(Seq(Write(1, "x", 1), Write(1, "x", 2), Read(2, "x", 1)), Set(1, 2),
      versionOrder = Map("x" -> Seq(2)))
    assert(Phenomena.analyze(direct).g1b)
    val viaDerivation = History(
      Seq(Write(1, "x", 1), Write(1, "x", 2), Derive(3, "y", 1, Seq(("x", 1))), Read(2, "y", 1)),
      Set(1, 2, 3), versionOrder = Map("x" -> Seq(2), "y" -> Seq(1)))
    assert(Phenomena.analyze(viaDerivation).g1b, "reading a value derived from an intermediate version is G1b")
  }

  test("G1c: circular information flow without anti-dependencies") {
    val h = History(
      Seq(Write(1, "x", 1), Read(2, "x", 1), Write(2, "y", 1), Read(1, "y", 1)),
      Set(1, 2))
    assert(Phenomena.analyze(h).g1c)
  }

  test("PL-2+ classification: G-single absent, G1 absent") {
    // simple wr chain — no cycles at all
    val h = History(Seq(Write(1, "x", 1), Read(2, "x", 1)), Set(1, 2))
    val r = Phenomena.analyze(h)
    assert(r.strongestLevel == "PL-3 (serializable)")
  }

  // ---- randomized histories for the theorems ----

  private def randomHistory(seed: Int): History = {
    val rng = new Random(seed)
    val nTxn = 4 + rng.nextInt(4)
    val objs = Seq("x", "u", "v")
    val ops = scala.collection.mutable.ArrayBuffer.empty[Op]
    val versions = scala.collection.mutable.Map.empty[String, Int]
    // base writes
    for (o <- objs; v <- 1 to 1 + rng.nextInt(3)) {
      ops += Write(1 + rng.nextInt(nTxn), o, v)
      versions(o) = v
    }
    // derivations over written versions (possibly chained)
    var derivedCount = 0
    for (_ <- 0 until 2 + rng.nextInt(3)) {
      derivedCount += 1
      val dObj = s"d$derivedCount"
      val nSrc = 1 + rng.nextInt(2)
      val srcs = Seq.fill(nSrc) {
        val pool = versions.toSeq
        val (o, vMax) = pool(rng.nextInt(pool.size))
        (o, 1 + rng.nextInt(vMax))
      }
      ops += Derive(1 + rng.nextInt(nTxn), dObj, 1, srcs)
      versions(dObj) = 1
    }
    // reads of anything
    for (_ <- 0 until 3 + rng.nextInt(4)) {
      val pool = versions.toSeq
      val (o, vMax) = pool(rng.nextInt(pool.size))
      ops += Read(1 + rng.nextInt(nTxn), o, 1 + rng.nextInt(vMax))
    }
    History(ops.toSeq, committed = (1 to nTxn).toSet)
  }

  test("Theorem 1 (transaction invariance): moving a derivation preserves all dependencies") {
    var checked = 0
    for (seed <- 1 to 60) {
      val h = randomHistory(seed)
      val derivations = h.ops.collect { case d: Derive => d }
      for (d <- derivations.headOption) {
        val h2 = h.moveDerivation(d.obj, d.ver, toTxn = 99, newVer = d.ver + 100)
        assert(Dsg.edges(h) == Dsg.edges(h2).filterNot(e => e.from == 99 || e.to == 99),
          s"seed $seed: dependencies changed when moving derivation")
        assert(!Dsg.edges(h2).exists(e => e.from == 99 || e.to == 99),
          s"seed $seed: a derivation-only transaction acquired edges")
        checked += 1
      }
    }
    assert(checked > 40)
  }

  test("Corollary 2 (encapsulation): dropping an encapsulated derivation preserves dependencies") {
    // Build histories where a derivation is fully encapsulated.
    for (seed <- 1 to 30) {
      val rng = new Random(seed)
      val t = 1 + rng.nextInt(3)
      val h = History(
        Seq(
          Write(t, "x", 1),
          Derive(t, "y", 1, Seq(("x", 1))),
          Read(t, "y", 1),
          Write(4, "x", 2),
          Read(5, "x", rng.nextInt(2) + 1),
        ),
        committed = Set(t, 4, 5))
      assert(h.isEncapsulated("y", 1), s"seed $seed")
      val h2 = h.withoutDerivation("y", 1)
      assert(Dsg.edges(h) == Dsg.edges(h2), s"seed $seed: encapsulated derivation affected the DSG")
    }
  }

  test("analysis is deterministic and fast on randomized histories") {
    for (seed <- 1 to 50) {
      val h = randomHistory(seed)
      val a = Phenomena.analyze(h)
      val b = Phenomena.analyze(h)
      assert(a == b)
    }
  }
}
