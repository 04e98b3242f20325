package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Full (non-incremental) evaluation of a [[DtQuery]] through Catalyst.
  *
  * `snapshot` takes a binding from source-table name to a *plain*
  * DataFrame and returns the plain query result. This is what a FULL
  * refresh executes, what initialization executes, and the reference
  * against which every incremental path is checked (the paper's §6.1
  * property: run the defining query as of the data timestamp and you must
  * get exactly the DT's contents).
  */
object Eval {

  def snapshot(q: DtQuery, bind: String => DataFrame): DataFrame = q match {
    case Scan(t) => bind(t)

    case Filter(c, p) => snapshot(c, bind).where(expr(p))

    case Project(c, exprs) =>
      snapshot(c, bind).select(exprs.map { case (a, e) => expr(e).as(a) }: _*)

    case UnionAll(l, r) => snapshot(l, bind).unionByName(snapshot(r, bind))

    case Join(l, r, lk, rk, jt) =>
      val lf = snapshot(l, bind)
      val rf = snapshot(r, bind)
      val overlap = lf.columns.toSet.intersect(rf.columns.toSet)
      require(overlap.isEmpty, s"join sides share columns $overlap — rename with Project first")
      val cond = lk.zip(rk).map { case (a, b) => lf(a) === rf(b) }.reduce(_ && _)
      lf.join(rf, cond, jt)

    case Aggregate(c, groupBy, aggs) =>
      val in = snapshot(c, bind)
      val aggCols = aggs.map { case (a, e) => expr(e).as(a) }
      if (groupBy.isEmpty) in.agg(aggCols.head, aggCols.tail: _*)
      else in.groupBy(groupBy.map(col): _*).agg(aggCols.head, aggCols.tail: _*)

    case Distinct(c) => snapshot(c, bind).distinct()

    case WindowOp(c, _, selects) =>
      snapshot(c, bind).selectExpr(selects.map { case (a, e) => s"$e AS $a" }: _*)

    case LateralFlatten(c, arrayExpr, as) =>
      val in = snapshot(c, bind)
      in.select((in.columns.map(col) :+ explode(expr(arrayExpr)).as(as)).toIndexedSeq: _*)
  }
}
