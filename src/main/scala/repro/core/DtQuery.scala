package repro.core

/** The logical IR for dynamic-table defining queries.
  *
  * This plays the role of Snowflake's relational representation in §5.4:
  * the engine evaluates it through Spark's Catalyst (see [[Eval]]) and the
  * differentiation framework rewrites it into delta queries (see
  * [[Differentiator]]). Expressions are Spark SQL strings, parsed with
  * `expr(...)`, so the same text can be handed to the DuckDB oracle.
  *
  * Operator coverage matches §3.3.2: projections, filters, union-all,
  * inner and outer equi-joins, LATERAL FLATTEN, distinct and grouped
  * aggregations, and partitioned window functions are incrementally
  * maintainable; scalar (ungrouped) aggregates are not and force FULL
  * refresh mode.
  */
sealed trait DtQuery {
  def children: Seq[DtQuery]

  /** Names of all source tables scanned anywhere beneath this node. */
  final def sources: Set[String] = this match {
    case Scan(t) => Set(t)
    case q       => q.children.flatMap(_.sources).toSet
  }

  /** Whether every operator in the tree supports incremental refresh. */
  final def incrementallySupported: Boolean = this match {
    case Aggregate(_, groupBy, _) if groupBy.isEmpty => false
    case q => q.children.forall(_.incrementallySupported)
  }
}

/** Scan of a base table or an upstream dynamic table. */
final case class Scan(table: String) extends DtQuery {
  override def children: Seq[DtQuery] = Nil
}

/** `WHERE predicate` — predicate is a Spark SQL boolean expression. */
final case class Filter(child: DtQuery, predicate: String) extends DtQuery {
  override def children: Seq[DtQuery] = Seq(child)
}

/** `SELECT expr AS alias, ...` — each entry is (alias, expression). */
final case class Project(child: DtQuery, exprs: Seq[(String, String)]) extends DtQuery {
  require(exprs.nonEmpty, "projection needs at least one column")
  require(exprs.map(_._1).distinct.size == exprs.size, "duplicate projection aliases")
  override def children: Seq[DtQuery] = Seq(child)
}

/** UNION ALL of two inputs with identical schemas. */
final case class UnionAll(left: DtQuery, right: DtQuery) extends DtQuery {
  override def children: Seq[DtQuery] = Seq(left, right)
}

/** Equi-join. `joinType` ∈ {inner, left, right, full}. Column names of the
  * two sides must be disjoint (enforce with [[Project]] renames upstream).
  */
final case class Join(
    left: DtQuery,
    right: DtQuery,
    leftKeys: Seq[String],
    rightKeys: Seq[String],
    joinType: String = "inner",
) extends DtQuery {
  require(leftKeys.nonEmpty && leftKeys.size == rightKeys.size, "equi-join needs aligned key lists")
  require(Set("inner", "left", "right", "full").contains(joinType), s"unsupported join type $joinType")
  override def children: Seq[DtQuery] = Seq(left, right)
}

/** `GROUP BY groupBy` with aggregate expressions (alias, aggExpr), e.g.
  * ("revenue", "sum(l_extendedprice * (1 - l_discount))"). An empty
  * `groupBy` is a scalar aggregate — evaluable, but not incrementally
  * maintainable (matches §3.3.2).
  */
final case class Aggregate(child: DtQuery, groupBy: Seq[String], aggs: Seq[(String, String)]) extends DtQuery {
  require(aggs.nonEmpty, "aggregate needs at least one aggregate expression")
  override def children: Seq[DtQuery] = Seq(child)
}

/** SELECT DISTINCT over all columns of the input. */
final case class Distinct(child: DtQuery) extends DtQuery {
  override def children: Seq[DtQuery] = Seq(child)
}

/** Partitioned window functions: each select entry is (alias, expression)
  * where expressions may contain window functions whose PARTITION BY
  * clause uses exactly `partitionBy` (the differentiation rule recomputes
  * affected partitions, §5.5.1 — ORDER BY ties must break repeatably).
  */
final case class WindowOp(child: DtQuery, partitionBy: Seq[String], selects: Seq[(String, String)]) extends DtQuery {
  require(partitionBy.nonEmpty, "only partitioned window functions are incrementally supported (§3.3.2)")
  override def children: Seq[DtQuery] = Seq(child)
}

/** LATERAL FLATTEN: explode the array-typed expression `arrayExpr` into a
  * new column `as`, keeping all input columns.
  */
final case class LateralFlatten(child: DtQuery, arrayExpr: String, as: String) extends DtQuery {
  override def children: Seq[DtQuery] = Seq(child)
}
