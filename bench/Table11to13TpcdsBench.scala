package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Tables 11, 12, 13 — average runtimes of every implemented TPC-DS query at
  * the three scale factors; plus the TPC-DS half of Table 14.
  */
class Table11to13TpcdsBench extends AnyFunSuite {
  import BenchHarness._

  private lazy val sw = sweep("tpcds")
  private val systems = Seq("TAG_local", "spark_sql", "duckdb")
  private lazy val queries = repro.workload.DsQueries.queries

  private def perSfTable(label: String, tableNo: Int): Unit = {
    val per = sw(label)
    table(s"Table $tableNo (repro): TPC-DS runtimes at $label, seconds",
      Seq("query", "category") ++ systems,
      queries.map(q => Seq(q.name, q.category) ++ systems.map(s => fmt(per(q.name)(s)))))
    queries.foreach(q => systems.foreach(s => assert(per(q.name)(s) > 0)))
  }

  test("Table 13: TPC-DS per-query runtimes at SF-30")(perSfTable("SF-30", 13))
  test("Table 12: TPC-DS per-query runtimes at SF-50")(perSfTable("SF-50", 12))
  test("Table 11: TPC-DS per-query runtimes at SF-75")(perSfTable("SF-75", 11))

  test("Table 14 (TPC-DS half): aggregate runtimes per system") {
    table("Table 14 (repro, TPC-DS): aggregate time, seconds",
      "" +: Sfs.map(_._1),
      systems.map(s => s +: Sfs.map { case (l, _) => fmt(sw(l).values.map(_(s)).sum) }))
    val tag = sw("SF-75").values.map(_("TAG_local")).sum
    val spk = sw("SF-75").values.map(_("spark_sql")).sum
    info(f"aggregate SF-75: TAG=${tag}%.2fs spark=${spk}%.2fs speedup=${spk / tag}%.1fx")
    // the paper's headline: TAG-join dominates on TPC-DS (5x-30x aggregate)
    assert(tag < spk, "TAG-join should dominate Spark SQL in aggregate on TPC-DS")
  }
}
