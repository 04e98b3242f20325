package repro.core

import repro.{Oracle, ReproSpec, SynthData}

/** Incrementally maintained DTs checked against DuckDB running the
  * defining SQL over the final source snapshots — result equality, not
  * just "it ran" (per the harness contract).
  */
class EngineOracleSpec extends ReproSpec {
  private lazy val testImplicits = spark.implicits
  import testImplicits._

  test("maintained filter+project DT matches DuckDB") {
    val (e, clock) = newEngine()
    e.createBaseTable("li", SynthData.lineitem(spark, 0.001, seed = 10))
    val q = Project(Filter(Scan("li"), "l_quantity > 25"),
      Seq("l_orderkey" -> "l_orderkey", "rev" -> "l_extendedprice * (1 - l_discount)"))
    e.createDynamicTable(DtSpec("filt", q, LagSeconds(600)))
    clock.advance(10)
    e.insert("li", SynthData.lineitem(spark, 0.0005, seed = 77))
    clock.advance(10)
    e.refresh("filt", clock.nowSeconds)
    Oracle.assertEquivalent(
      e.read("filt"),
      "SELECT l_orderkey, CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) AS rev " +
        "FROM li WHERE CAST(l_quantity AS DOUBLE) > 25",
      "li" -> e.read("li"))
  }

  test("maintained grouped-aggregate DT matches DuckDB after mixed DML") {
    val (e, clock) = newEngine()
    e.createBaseTable("li", SynthData.lineitem(spark, 0.001, seed = 3))
    // decimal sum: exact, order-independent — doubles would make the
    // merged group rows ULP-unstable (§3.4 FP restriction)
    val q = Aggregate(Scan("li"), Seq("l_returnflag", "l_linestatus"),
      Seq("cnt" -> "count(1)", "qty" -> "sum(cast(l_quantity as decimal(14,6)))"))
    e.createDynamicTable(DtSpec("agg", q, LagSeconds(600)))
    clock.advance(10)
    val dels = e.read("li").limit(50)
    e.dml("li", SynthData.lineitem(spark, 0.0003, seed = 99), dels)
    clock.advance(10)
    e.refresh("agg", clock.nowSeconds)
    Oracle.assertEquivalent(
      e.read("agg"),
      "SELECT l_returnflag, l_linestatus, count(1) AS cnt, sum(CAST(l_quantity AS DECIMAL(14,6))) AS qty " +
        "FROM li GROUP BY l_returnflag, l_linestatus",
      "li" -> e.read("li"))
  }

  test("maintained join DT matches DuckDB") {
    val (e, clock) = newEngine()
    e.createBaseTable("ord", SynthData.orders(spark, 0.002, seed = 5))
    e.createBaseTable("cust", SynthData.customer(spark, 0.02, seed = 6))
    val q = Aggregate(
      Join(Scan("ord"),
        Project(Scan("cust"), Seq("ck" -> "c_custkey", "seg" -> "c_mktsegment")),
        Seq("o_custkey"), Seq("ck")),
      Seq("seg"), Seq("n" -> "count(1)", "total" -> "round(sum(o_totalprice), 2)"))
    e.createDynamicTable(DtSpec("by_seg", q, LagSeconds(600)))
    clock.advance(10)
    e.insert("ord", repro.SynthCdc.ordersRows(spark, 500, seed = 55, keyOffset = 10_000_000L))
    clock.advance(10)
    e.refresh("by_seg", clock.nowSeconds)
    Oracle.assertEquivalent(
      e.read("by_seg"),
      "SELECT c_mktsegment AS seg, count(1) AS n, round(sum(CAST(o_totalprice AS DOUBLE)), 2) AS total " +
        "FROM ord JOIN cust ON ord.o_custkey = cust.c_custkey GROUP BY c_mktsegment",
      "ord" -> e.read("ord"), "cust" -> e.read("cust"))
  }

  test("maintained left-join DT with dimension updates matches DuckDB") {
    val (e, clock) = newEngine()
    e.createBaseTable("f", Seq((1, 10.0), (2, 20.0), (3, 30.0)).toDF("fk", "amt"))
    e.createBaseTable("d", Seq((1, "east"), (2, "west")).toDF("dk", "region"))
    val q = Join(Scan("f"), Scan("d"), Seq("fk"), Seq("dk"), "left")
    e.createDynamicTable(DtSpec("lj", q, LagSeconds(600)))
    clock.advance(10)
    e.dml("d", Seq((3, "north")).toDF("dk", "region"), Seq((2, "west")).toDF("dk", "region"))
    clock.advance(10)
    e.refresh("lj", clock.nowSeconds)
    Oracle.assertEquivalent(
      e.read("lj"),
      "SELECT f.fk, CAST(f.amt AS DOUBLE) AS amt, d.dk, d.region FROM f LEFT JOIN d ON f.fk = d.dk",
      "f" -> e.read("f"), "d" -> e.read("d"))
  }
}
