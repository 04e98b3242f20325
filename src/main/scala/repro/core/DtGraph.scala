package repro.core

/** The DAG induced by read dependencies between dynamic tables (§3.1.2):
  * vertices are DTs, edges point from upstream to downstream. Base tables
  * are leaves and are not vertices here.
  */
final class DtGraph(val specs: Seq[DtSpec]) {
  private val byName: Map[String, DtSpec] = specs.map(s => s.name -> s).toMap
  require(byName.size == specs.size, "duplicate DT names")

  /** Upstream *DTs* of a DT (sources that are themselves DTs). */
  def upstream(name: String): Seq[String] =
    byName(name).query.sources.toSeq.sorted.filter(byName.contains)

  /** Direct downstream DTs. */
  def downstream(name: String): Seq[String] =
    specs.filter(s => upstream(s.name).contains(name)).map(_.name)

  /** All DTs in a topological order (upstream before downstream).
    * Throws on cycles — cycles are not allowed (§3.1.1).
    */
  lazy val topoOrder: Seq[String] = {
    val visiting = scala.collection.mutable.Set.empty[String]
    val done = scala.collection.mutable.LinkedHashSet.empty[String]
    def visit(n: String): Unit = {
      if (!done.contains(n)) {
        require(visiting.add(n), s"cycle through dynamic table $n")
        upstream(n).foreach(visit)
        visiting.remove(n)
        done += n
      }
    }
    specs.map(_.name).foreach(visit)
    done.toSeq
  }

  /** Transitive upstream closure, in topological order. */
  def upstreamClosure(name: String): Seq[String] = {
    val seen = scala.collection.mutable.LinkedHashSet.empty[String]
    def walk(n: String): Unit = upstream(n).foreach { u =>
      if (!seen.contains(u)) { walk(u); seen += u }
    }
    walk(name)
    topoOrder.filter(seen.contains)
  }

  /** Resolve target lags (§3.2): a duration resolves to itself; DOWNSTREAM
    * resolves to the minimum resolved lag of direct downstream DTs, or
    * `None` (refresh only on demand) if there are none.
    */
  lazy val resolvedLag: Map[String, Option[Long]] = {
    val memo = scala.collection.mutable.Map.empty[String, Option[Long]]
    def resolve(n: String): Option[Long] = memo.getOrElseUpdate(n, byName(n).targetLag match {
      case LagSeconds(s) => Some(s)
      case DownstreamLag =>
        val ds = downstream(n).flatMap(resolve)
        if (ds.isEmpty) None else Some(ds.min)
    })
    // Resolve sinks first so DOWNSTREAM chains terminate.
    topoOrder.reverse.foreach(resolve)
    memo.toMap
  }

  /** The lag that drives a DT's refresh *period* (§5.2): a DT must refresh
    * at least as often as every downstream consumer, so its effective lag
    * is the min of its own resolved lag and all downstream effective lags.
    */
  lazy val effectiveLag: Map[String, Option[Long]] = {
    val memo = scala.collection.mutable.Map.empty[String, Option[Long]]
    def eff(n: String): Option[Long] = memo.getOrElseUpdate(n, {
      val mine = resolvedLag(n)
      val ds = downstream(n).flatMap(eff)
      (mine.toSeq ++ ds) match {
        case Nil => None
        case xs  => Some(xs.min)
      }
    })
    topoOrder.reverse.foreach(eff)
    memo.toMap
  }
}
