package repro.isolation

import org.scalatest.funsuite.AnyFunSuite

/** History model: derivation closure, intermediates, encapsulation. */
class HistorySpec extends AnyFunSuite {

  test("derivesFrom is the transitive closure of derivation steps") {
    val h = History(
      ops = Seq(
        Write(1, "x", 1),
        Derive(2, "y", 1, Seq(("x", 1))),
        Derive(3, "z", 1, Seq(("y", 1))),
      ),
      committed = Set(1, 2, 3),
    )
    assert(h.derives(("y", 1), ("x", 1)))
    assert(h.derives(("z", 1), ("y", 1)))
    assert(h.derives(("z", 1), ("x", 1)), "closure must be transitive")
    assert(!h.derives(("x", 1), ("z", 1)))
  }

  test("multi-source derivations fan out") {
    val h = History(
      ops = Seq(Write(1, "a", 1), Write(2, "b", 1), Derive(3, "j", 1, Seq(("a", 1), ("b", 1)))),
      committed = Set(1, 2, 3))
    assert(h.derives(("j", 1), ("a", 1)) && h.derives(("j", 1), ("b", 1)))
  }

  test("version order defaults to install order") {
    val h = History(Seq(Write(1, "x", 5), Write(2, "x", 9)), Set(1, 2))
    assert(h.order("x") == Seq(5, 9))
    assert(h.nextVersion("x", 5) == Some(9))
    assert(h.nextVersion("x", 9).isEmpty)
  }

  test("explicit version order wins") {
    val h = History(Seq(Write(1, "x", 5), Write(2, "x", 9)), Set(1, 2), versionOrder = Map("x" -> Seq(9, 5)))
    assert(h.nextVersion("x", 9) == Some(5))
  }

  test("intermediate versions are non-final writes within a transaction") {
    val h = History(Seq(Write(1, "x", 1), Write(1, "x", 2), Write(2, "x", 3)), Set(1, 2))
    assert(h.intermediateVersions == Set(("x", 1)))
  }

  test("encapsulated derivation: sources and readers inside one txn") {
    val h = History(
      ops = Seq(Write(1, "x", 1), Derive(1, "y", 1, Seq(("x", 1))), Read(1, "y", 1)),
      committed = Set(1))
    assert(h.isEncapsulated("y", 1))
  }

  test("derivation read by another txn is not encapsulated") {
    val h = History(
      ops = Seq(Write(1, "x", 1), Derive(1, "y", 1, Seq(("x", 1))), Read(2, "y", 1)),
      committed = Set(1, 2))
    assert(!h.isEncapsulated("y", 1))
  }

  test("derivation reading another txn's value is not encapsulated") {
    val h = History(
      ops = Seq(Write(1, "x", 1), Derive(2, "y", 1, Seq(("x", 1)))),
      committed = Set(1, 2))
    assert(!h.isEncapsulated("y", 1))
  }

  test("moveDerivation relocates the op and redirects readers") {
    val h = History(
      ops = Seq(Write(1, "x", 1), Derive(2, "y", 1, Seq(("x", 1))), Read(3, "y", 1)),
      committed = Set(1, 2, 3))
    val h2 = h.moveDerivation("y", 1, toTxn = 9, newVer = 2)
    assert(h2.ops.contains(Derive(9, "y", 2, Seq(("x", 1)))))
    assert(h2.ops.contains(Read(3, "y", 2)))
    assert(!h2.ops.exists { case Derive(2, _, _, _) => true; case _ => false })
  }
}
