package repro.bench

import repro.SparkSpec
import repro.exp.T4OperatorCoverage

/** T4 — operator coverage matrix (§3.3.2 + Figure 6 operator mix). */
class T4OperatorBench extends SparkSpec {

  test("T4: every supported operator refreshes incrementally and matches recompute") {
    val rows = sys.env.getOrElse("REPRO_T4_ROWS", "100000").toLong
    val r = T4OperatorCoverage.run(spark, rows)
    println(r.table)

    // every operator's maintained result equals a from-scratch evaluation
    assert(r.rows.forall(_.correct), s"incorrect operators: ${r.rows.filterNot(_.correct).map(_.operator)}")
    // §3.3.2 support matrix
    val scalar = r.rows.find(_.operator == "scalar aggregate").get
    assert(!scalar.supported && scalar.action == "FullRefresh")
    val supported = r.rows.filterNot(_.operator == "scalar aggregate")
    assert(supported.forall(_.supported))
    assert(supported.forall(_.action == "IncrementalRefresh"),
      s"unexpected actions: ${supported.filterNot(_.action == "IncrementalRefresh")}")
  }
}
