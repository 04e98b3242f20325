package repro.isolation

/** Direct Serialization Graph with the paper's extended dependency
  * definitions (§4). Nodes are committed transactions; edges carry a
  * label. Each extended rule adds, to Adya's prior definition, the cases
  * induced by derivation paths.
  */
object Dsg {

  sealed trait Label
  case object WR extends Label // (item-)read-dependency
  case object WW extends Label // write-dependency
  case object RW extends Label // (item-)anti-dependency

  final case class Edge(from: Int, to: Int, label: Label)

  /** All dependency edges of a history (committed transactions only,
    * self-edges excluded as in Adya).
    */
  def edges(h: History): Set[Edge] = {
    val out = Set.newBuilder[Edge]
    def committed(t: Int) = h.committed.contains(t)

    val reads = h.ops.collect { case r: Read => r }
    val writes = h.ops.collect { case w: Write => w }

    // --- read-dependencies (wr) ---
    for (r <- reads if committed(r.txn)) {
      // prior definition: Ti installs x_i, Tj reads x_i
      for (w <- writes if committed(w.txn) && w.txn != r.txn && w.obj == r.obj && w.ver == r.ver)
        out += Edge(w.txn, r.txn, WR)
      // extension: Ti installs y_k, Tj reads x_i, x_i derives from y_k
      for (w <- writes if committed(w.txn) && w.txn != r.txn && h.derives((r.obj, r.ver), (w.obj, w.ver)))
        out += Edge(w.txn, r.txn, WR)
    }

    // --- anti-dependencies (rw) ---
    // A read of state the reader itself wrote is not an *observation* of
    // foreign state: the ordering it implies is already captured by the
    // ww edge to the overwriter. Excluding it keeps both Theorem 1 (edges
    // from a read depend only on the derivation's sources, never on which
    // transaction held the derivation) and Corollary 2 (an encapsulated
    // derivation contributes no edges at all) exactly true.
    def selfWritten(txn: Int, obj: String, ver: Int): Boolean =
      h.writerOf(obj, ver).contains(txn)
    for (r <- reads if committed(r.txn)) {
      // prior definition: Ti reads x_k, Tj installs x's next version
      if (!selfWritten(r.txn, r.obj, r.ver))
        for {
          nv <- h.nextVersion(r.obj, r.ver).toSeq
          w <- writes if committed(w.txn) && w.txn != r.txn && w.obj == r.obj && w.ver == nv
        } out += Edge(r.txn, w.txn, RW)
      // extension: Ti reads x_k, x_k derives from y_m, Tj installs y's next version
      for {
        (yo, yv) <- h.derivesFrom.getOrElse((r.obj, r.ver), Set.empty)
        if !selfWritten(r.txn, yo, yv)
        nv <- h.nextVersion(yo, yv).toSeq
        w <- writes if committed(w.txn) && w.txn != r.txn && w.obj == yo && w.ver == nv
      } out += Edge(r.txn, w.txn, RW)
    }

    // --- write-dependencies (ww) ---
    // prior definition: Ti installs x_i, Tj installs x's next version
    for {
      (obj, v1, v2) <- h.consecutivePairs
      wi <- h.writerOf(obj, v1).toSeq if committed(wi)
      wj <- h.writerOf(obj, v2).toSeq if committed(wj) && wi != wj
    } out += Edge(wi, wj, WW)
    // extension: Ti installs x_i, Tj installs y_j, and consecutive
    // z_k ≪ z_m with z_k derives-from x_i and z_m derives-from y_j
    for {
      (zObj, zk, zm) <- h.consecutivePairs
      (xo, xv) <- h.derivesFrom.getOrElse((zObj, zk), Set.empty)
      (yo, yv) <- h.derivesFrom.getOrElse((zObj, zm), Set.empty)
      wi <- h.writerOf(xo, xv).toSeq if committed(wi)
      wj <- h.writerOf(yo, yv).toSeq if committed(wj) && wi != wj
    } out += Edge(wi, wj, WW)

    out.result().filterNot(e => e.from == e.to)
  }

  /** Nodes of the DSG: committed transactions that have at least one
    * read/write op, or appear in an edge. Transactions consisting solely
    * of derivations have no edges — they vanish from the graph, which is
    * precisely Figure 2's point.
    */
  def nodes(h: History, es: Set[Edge]): Set[Int] =
    es.flatMap(e => Set(e.from, e.to)) ++
      h.ops.collect { case op @ (_: Read | _: Write) if h.committed.contains(op.txn) => op.txn }

  /** Is there a cycle using only edges whose label is in `labels`? */
  def hasCycle(es: Set[Edge], labels: Set[Label]): Boolean = {
    val sub = es.filter(e => labels.contains(e.label))
    val adj = sub.groupBy(_.from).view.mapValues(_.map(_.to)).toMap
    val ns = sub.flatMap(e => Set(e.from, e.to))
    // DFS cycle detection
    val color = scala.collection.mutable.Map.empty[Int, Int] // 0 white 1 grey 2 black
    def dfs(n: Int): Boolean = color.getOrElse(n, 0) match {
      case 1 => true
      case 2 => false
      case _ =>
        color(n) = 1
        val cyc = adj.getOrElse(n, Set.empty).exists(dfs)
        color(n) = 2
        cyc
    }
    ns.exists(n => color.getOrElse(n, 0) == 0 && dfs(n))
  }

  /** Cycles with exactly one anti-dependency edge (G-single): an RW edge
    * (a → b) closed by a WW/WR-only path from b back to a.
    */
  def hasSingleAntiCycle(es: Set[Edge]): Boolean = {
    val forward = es.filter(e => e.label == WW || e.label == WR)
    val adj = forward.groupBy(_.from).view.mapValues(_.map(_.to)).toMap
    def reaches(from: Int, to: Int): Boolean = {
      val seen = scala.collection.mutable.Set(from)
      val stack = scala.collection.mutable.Stack(from)
      var found = from == to
      while (stack.nonEmpty && !found) {
        val n = stack.pop()
        for (m <- adj.getOrElse(n, Set.empty) if seen.add(m)) {
          if (m == to) found = true else stack.push(m)
        }
      }
      found
    }
    es.exists(e => e.label == RW && reaches(e.to, e.from))
  }
}
