package repro.isolation

/** The isolation phenomena of Adya [2], generalized to histories with
  * derivations (§4). For all but G1b the definitions are textually the
  * same — derivations induce *new instances* through the extended
  * dependency rules of [[Dsg]].
  */
object Phenomena {

  final case class Report(
      g0: Boolean,
      g1a: Boolean,
      g1b: Boolean,
      g1c: Boolean,
      g2: Boolean,
      gSingle: Boolean,
  ) {
    /** Phenomena present, by name. */
    def present: Set[String] = Set(
      "G0" -> g0, "G1a" -> g1a, "G1b" -> g1b, "G1c" -> g1c, "G2" -> g2, "G-single" -> gSingle,
    ).collect { case (n, true) => n }

    /** Strongest Adya PL level whose proscribed phenomena are absent. */
    def strongestLevel: String =
      if (!g1a && !g1b && !g1c && !g0 && !g2) "PL-3 (serializable)"
      else if (!g1a && !g1b && !g1c && !g0 && !gSingle) "PL-2+ (basic consistency)"
      else if (!g1a && !g1b && !g1c && !g0) "PL-2 (read committed)"
      else if (!g0) "PL-1"
      else "none"
  }

  def analyze(h: History): Report = {
    val es = Dsg.edges(h)

    // G1a Aborted Read: a committed txn reads a version written by an
    // aborted txn, or a version deriving from one.
    val abortedVersions: Set[(String, Int)] = h.ops.collect {
      case Write(t, o, v) if h.aborted.contains(t) => (o, v)
    }.toSet
    val g1a = h.ops.exists {
      case Read(t, o, v) if h.committed.contains(t) =>
        abortedVersions.contains((o, v)) ||
          abortedVersions.exists(av => h.derives((o, v), av))
      case _ => false
    }

    // G1b Intermediate Read: a committed txn reads an intermediate
    // version, or a version deriving from an intermediate version.
    val g1b = h.ops.exists {
      case Read(t, o, v) if h.committed.contains(t) =>
        h.intermediateVersions.contains((o, v)) ||
          h.intermediateVersions.exists(iv => h.derives((o, v), iv))
      case _ => false
    }

    val g0 = Dsg.hasCycle(es, Set(Dsg.WW))
    val g1c = Dsg.hasCycle(es, Set(Dsg.WW, Dsg.WR))
    // G2: a cycle containing at least one anti-dependency edge — an RW
    // edge (a → b) closed by any path b → a in the full DSG.
    val full = es.groupBy(_.from).view.mapValues(_.map(_.to)).toMap
    def reaches(from: Int, to: Int): Boolean = {
      val seen = scala.collection.mutable.Set(from)
      val stack = scala.collection.mutable.Stack(from)
      var found = from == to
      while (stack.nonEmpty && !found) {
        val n = stack.pop()
        for (m <- full.getOrElse(n, Set.empty) if seen.add(m))
          if (m == to) found = true else stack.push(m)
      }
      found
    }
    val g2 = es.exists(e => e.label == Dsg.RW && reaches(e.to, e.from))
    val gSingle = Dsg.hasSingleAntiCycle(es)

    Report(g0, g1a, g1b, g1c, g2, gSingle)
  }
}
