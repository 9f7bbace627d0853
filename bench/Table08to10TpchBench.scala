package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Tables 8, 9, 10 — average runtimes of every implemented TPC-H query at
  * the three scale factors, for TAG-join, Spark SQL and DuckDB; plus the
  * TPC-H half of Table 14 (aggregate time per system and SF).
  */
class Table08to10TpchBench extends AnyFunSuite {
  import BenchHarness._

  private lazy val sw = sweep("tpch")
  private val systems = Seq("TAG_local", "spark_sql", "duckdb")
  private val queryOrder =
    repro.workload.TpchQueries.queries.map(_.name)

  private def perSfTable(label: String, tableNo: Int): Unit = {
    val per = sw(label)
    table(s"Table $tableNo (repro): TPC-H runtimes at $label, seconds",
      "query" +: systems,
      queryOrder.map(q => q +: systems.map(s => fmt(per(q)(s)))))
    queryOrder.foreach(q => systems.foreach(s => assert(per(q)(s) > 0)))
  }

  test("Table 10: TPC-H per-query runtimes at SF-30")(perSfTable("SF-30", 10))
  test("Table 9: TPC-H per-query runtimes at SF-50")(perSfTable("SF-50", 9))
  test("Table 8: TPC-H per-query runtimes at SF-75")(perSfTable("SF-75", 8))

  test("Table 14 (TPC-H half): aggregate runtimes per system") {
    table("Table 14 (repro, TPC-H): aggregate time, seconds",
      "" +: Sfs.map(_._1),
      systems.map(s => s +: Sfs.map { case (l, _) => fmt(sw(l).values.map(_(s)).sum) }))
    // sanity: all aggregates are positive. (Monotonicity in SF is NOT
    // asserted: at laptop scale, JVM warm-up noise on the first-SF sweep can
    // exceed the data-size effect for the JIT-heavy systems.)
    for (s <- systems; (l, _) <- Sfs)
      assert(sw(l).values.map(_(s)).sum > 0, s"$s at $l")
  }

  test("shape: TAG-join beats Spark SQL in aggregate on TPC-H (paper: 4.7x)") {
    val tag = sw("SF-75").values.map(_("TAG_local")).sum
    val spk = sw("SF-75").values.map(_("spark_sql")).sum
    info(f"aggregate SF-75: TAG=${tag}%.2fs spark_sql=${spk}%.2fs speedup=${spk / tag}%.1fx")
    assert(tag < spk, "TAG-join should beat Spark SQL in aggregate on TPC-H")
  }
}
