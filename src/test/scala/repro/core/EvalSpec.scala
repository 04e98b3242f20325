package repro.core

import org.apache.spark.sql.DataFrame
import repro.{Oracle, ReproSpec}

/** Full evaluation of the IR, including DuckDB oracle parity. */
class EvalSpec extends ReproSpec {
  private lazy val testImplicits = spark.implicits
  import testImplicits._

  private def kv: DataFrame = Seq(("a", 1, 10.0), ("a", 2, 20.0), ("b", 3, 30.0), ("c", 4, 40.0)).toDF("k", "i", "v")
  private def dim: DataFrame = Seq(("a", "east"), ("b", "west")).toDF("dk", "region")
  private def bind(m: (String, DataFrame)*): String => DataFrame = m.toMap

  test("Scan returns the bound table") {
    assertSameRows(Eval.snapshot(Scan("t"), bind("t" -> kv)), kv)
  }

  test("Filter applies the predicate") {
    val got = Eval.snapshot(Filter(Scan("t"), "i >= 3"), bind("t" -> kv))
    assert(got.collect().map(_.getInt(1)).sorted.toSeq == Seq(3, 4))
  }

  test("Project computes expressions with aliases") {
    val got = Eval.snapshot(Project(Scan("t"), Seq("k" -> "k", "double_v" -> "v * 2")), bind("t" -> kv))
    assert(got.columns.toSeq == Seq("k", "double_v"))
    assert(got.where("k = 'c'").collect().head.getDouble(1) == 80.0)
  }

  test("UnionAll keeps duplicates") {
    val got = Eval.snapshot(UnionAll(Scan("t"), Scan("t")), bind("t" -> kv))
    assert(got.count() == 8)
  }

  test("inner Join matches keys") {
    val q = Join(Scan("f"), Scan("d"), Seq("k"), Seq("dk"))
    val got = Eval.snapshot(q, bind("f" -> kv, "d" -> dim))
    assert(got.count() == 3) // a,a,b
  }

  test("Join rejects overlapping column names") {
    val q = Join(Scan("f"), Scan("f2"), Seq("k"), Seq("k"))
    intercept[IllegalArgumentException](Eval.snapshot(q, bind("f" -> kv, "f2" -> kv)))
  }

  test("left/full outer joins null-extend") {
    val left = Eval.snapshot(Join(Scan("f"), Scan("d"), Seq("k"), Seq("dk"), "left"), bind("f" -> kv, "d" -> dim))
    assert(left.count() == 4)
    assert(left.where("region is null").collect().map(_.getString(0)).toSeq == Seq("c"))
    val full = Eval.snapshot(Join(Scan("d"), Scan("f"), Seq("dk"), Seq("k"), "full"), bind("f" -> kv, "d" -> dim))
    assert(full.count() == 4) // a,a,b matched + c unmatched-right
  }

  test("grouped Aggregate") {
    val q = Aggregate(Scan("t"), Seq("k"), Seq("n" -> "count(1)", "s" -> "sum(v)"))
    val got = Eval.snapshot(q, bind("t" -> kv)).collect().map(r => (r.getString(0), r.getLong(1), r.getDouble(2))).toSet
    assert(got == Set(("a", 2L, 30.0), ("b", 1L, 30.0), ("c", 1L, 40.0)))
  }

  test("scalar Aggregate evaluates (FULL-mode only)") {
    val q = Aggregate(Scan("t"), Nil, Seq("n" -> "count(1)"))
    assert(Eval.snapshot(q, bind("t" -> kv)).collect().head.getLong(0) == 4L)
  }

  test("Distinct deduplicates") {
    val got = Eval.snapshot(Distinct(Project(Scan("t"), Seq("k" -> "k"))), bind("t" -> kv))
    assert(got.count() == 3)
  }

  test("partitioned WindowOp ranks within partitions") {
    val q = WindowOp(Scan("t"), Seq("k"), Seq("k" -> "k", "i" -> "i", "rn" -> "row_number() over (partition by k order by i)"))
    val got = Eval.snapshot(q, bind("t" -> kv))
    assert(got.where("k = 'a' and i = 2").collect().head.getAs[Int]("rn") == 2)
  }

  test("LateralFlatten explodes arrays") {
    val q = LateralFlatten(Scan("t"), "array(i, i * 10)", "e")
    val got = Eval.snapshot(q, bind("t" -> kv))
    assert(got.count() == 8)
    assert(got.where("k = 'b'").collect().map(_.getAs[Int]("e")).sorted.toSeq == Seq(3, 30))
  }

  test("oracle parity: filter + projection") {
    val q = Project(Filter(Scan("t"), "i >= 2"), Seq("k" -> "k", "v2" -> "v * 2"))
    Oracle.assertEquivalent(
      Eval.snapshot(q, bind("t" -> kv)),
      "SELECT k, CAST(v AS DOUBLE) * 2 AS v2 FROM t WHERE CAST(i AS INT) >= 2",
      "t" -> kv)
  }

  test("oracle parity: join + group by") {
    val q = Aggregate(Join(Scan("f"), Scan("d"), Seq("k"), Seq("dk")), Seq("region"), Seq("n" -> "count(1)"))
    Oracle.assertEquivalent(
      Eval.snapshot(q, bind("f" -> kv, "d" -> dim)),
      "SELECT region, count(1) AS n FROM f JOIN d ON f.k = d.dk GROUP BY region",
      "f" -> kv, "d" -> dim)
  }

  test("oracle parity: TPC-H-lite pricing summary shape (Q1-lite)") {
    val li = repro.SynthData.lineitem(spark, 0.002)
    val q = Aggregate(Filter(Scan("lineitem"), "l_shipdate <= date'1998-09-02'"),
      Seq("l_returnflag", "l_linestatus"),
      Seq("sum_qty" -> "sum(l_quantity)", "cnt" -> "count(1)"))
    Oracle.assertEquivalent(
      Eval.snapshot(q, bind("lineitem" -> li)),
      "SELECT l_returnflag, l_linestatus, sum(CAST(l_quantity AS DOUBLE)) AS sum_qty, count(1) AS cnt " +
        "FROM lineitem WHERE CAST(l_shipdate AS DATE) <= DATE '1998-09-02' GROUP BY l_returnflag, l_linestatus",
      "lineitem" -> li)
  }
}
