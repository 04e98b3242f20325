package repro.isolation

/** Adya-style transaction histories extended with *derivation* operations
  * (§4 of the paper).
  *
  * Operations on versioned objects: a version is identified by
  * `(obj, ver)`. [[Write]] *installs* a version by interacting with the
  * environment; [[Derive]] creates a version as pure computation from
  * already-stored versions, `d_i(x_i | y_j, …, z_k)`. A DT refresh
  * consists exclusively of derivations.
  */
sealed trait Op { def txn: Int }
final case class Read(txn: Int, obj: String, ver: Int) extends Op
final case class Write(txn: Int, obj: String, ver: Int) extends Op
final case class Derive(txn: Int, obj: String, ver: Int, sources: Seq[(String, Int)]) extends Op

/** A transaction history: an ordered list of operations, commit/abort
  * status per transaction, and the total version order per object
  * (committed versions only, in install order).
  */
final case class History(
    ops: Seq[Op],
    committed: Set[Int],
    aborted: Set[Int] = Set.empty,
    versionOrder: Map[String, Seq[Int]] = Map.empty,
) {
  require(committed.intersect(aborted).isEmpty, "a transaction cannot both commit and abort")

  /** Version order, defaulting to install (op) order when not given. */
  lazy val order: Map[String, Seq[Int]] =
    if (versionOrder.nonEmpty) versionOrder
    else ops.collect {
      case Write(_, o, v)     => (o, v)
      case Derive(_, o, v, _) => (o, v)
    }.groupBy(_._1).view.mapValues(_.map(_._2).distinct).toMap

  /** The version following `ver` in `obj`'s version order, if any. */
  def nextVersion(obj: String, ver: Int): Option[Int] = {
    val vs = order.getOrElse(obj, Nil)
    val i = vs.indexOf(ver)
    if (i >= 0 && i + 1 < vs.size) Some(vs(i + 1)) else None
  }

  /** Adjacent pairs `(z_k, z_m)` with `z_k ≪ z_m` for every object. */
  def consecutivePairs: Seq[(String, Int, Int)] =
    order.toSeq.flatMap { case (o, vs) => vs.sliding(2).collect { case Seq(a, b) => (o, a, b) } }

  /** Direct derivation edges: derived version -> source versions. */
  lazy val directDerivations: Map[(String, Int), Set[(String, Int)]] =
    ops.collect { case Derive(_, o, v, srcs) => (o, v) -> srcs.toSet }.toMap

  /** Transitive closure: all versions a derived version derives from
    * ("a path of derivations connecting them" — one or more steps).
    */
  lazy val derivesFrom: Map[(String, Int), Set[(String, Int)]] = {
    val memo = scala.collection.mutable.Map.empty[(String, Int), Set[(String, Int)]]
    def closure(v: (String, Int), seen: Set[(String, Int)]): Set[(String, Int)] =
      memo.getOrElse(v, {
        val direct = directDerivations.getOrElse(v, Set.empty)
        val all = direct ++ direct.filterNot(seen.contains).flatMap(d => closure(d, seen + v))
        memo(v) = all
        all
      })
    directDerivations.keys.foreach(v => closure(v, Set.empty))
    memo.toMap
  }

  /** True iff `x` derives (transitively) from `y`. */
  def derives(x: (String, Int), y: (String, Int)): Boolean =
    derivesFrom.getOrElse(x, Set.empty).contains(y)

  /** The transaction that installed (wrote) a version, if written. */
  def writerOf(obj: String, ver: Int): Option[Int] =
    ops.collectFirst { case Write(t, o, v) if o == obj && v == ver => t }

  /** Versions that are *intermediate*: their creator later created
    * another version of the same object within the same transaction
    * (Adya's installed version is the final one).
    */
  lazy val intermediateVersions: Set[(String, Int)] = {
    val creations = ops.collect {
      case Write(t, o, v)     => (t, o, v)
      case Derive(t, o, v, _) => (t, o, v)
    }
    creations.groupBy { case (t, o, _) => (t, o) }.values
      .flatMap(group => group.dropRight(1).map { case (_, o, v) => (o, v) })
      .toSet
  }

  /** Move a derivation into another transaction (Theorem 1's history
    * transformation): derivation creating `(obj, ver)` moves from its
    * transaction to `toTxn` as a new version `newVer`, and every read of
    * the old version is redirected to the new one.
    */
  def moveDerivation(obj: String, ver: Int, toTxn: Int, newVer: Int): History = {
    val newOps = ops.map {
      case Derive(_, o, v, srcs) if o == obj && v == ver => Derive(toTxn, o, newVer, srcs)
      case Read(t, o, v) if o == obj && v == ver         => Read(t, o, newVer)
      case Derive(t, o, v, srcs) =>
        Derive(t, o, v, srcs.map { case (so, sv) => if (so == obj && sv == ver) (so, newVer) else (so, sv) })
      case op => op
    }
    val newOrder = order.map { case (o, vs) =>
      o -> (if (o == obj) vs.map(v => if (v == ver) newVer else v) else vs)
    }
    History(newOps, committed + toTxn, aborted, newOrder)
  }

  /** Drop a derivation that is encapsulated in its transaction
    * (Corollary 2): remove the op; reads/derivations of its value must
    * all be inside the same transaction for the corollary to apply.
    */
  def withoutDerivation(obj: String, ver: Int): History =
    copy(ops = ops.filterNot {
      case Derive(_, o, v, _) => o == obj && v == ver
      case _                  => false
    }, versionOrder = order.map { case (o, vs) =>
      o -> (if (o == obj) vs.filterNot(_ == ver) else vs)
    })

  /** Is the derivation creating `(obj, ver)` encapsulated by its
    * transaction (only reads values written by it, value only read by it)?
    */
  def isEncapsulated(obj: String, ver: Int): Boolean = {
    ops.collectFirst { case d @ Derive(_, o, v, _) if o == obj && v == ver => d }.exists { d =>
      val outsideReaders = ops.exists {
        case Read(t, o, v) => t != d.txn && o == obj && v == ver
        case Derive(t, _, _, srcs) => t != d.txn && srcs.contains((obj, ver))
        case _ => false
      }
      val outsideSources = d.sources.exists { case (so, sv) =>
        !ops.exists {
          case Write(t, o, v)     => t == d.txn && o == so && v == sv
          case Derive(t, o, v, _) => t == d.txn && o == so && v == sv
          case _                  => false
        }
      }
      !outsideReaders && !outsideSources
    }
  }
}
