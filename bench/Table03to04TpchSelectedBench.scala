package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 3 — TAG-join runtimes on LA/correlated TPC-H queries at the top SF
  * with speedups over the other systems; Table 4 — runtimes of GA/scalar
  * queries. Both are projections of the Table-8 sweep, like the paper's.
  */
class Table03to04TpchSelectedBench extends AnyFunSuite {
  import BenchHarness._

  private lazy val per = sweep("tpch")(TopSf._1)

  test("Table 3: LA and correlated queries — TAG runtimes and speedups") {
    val la = Seq("q3", "q5", "q10", "q12")
    val corr = Seq("q17")
    val rows = (la.map(("LA", _)) ++ corr.map(("Corr", _))).map { case (cat, q) =>
      val t = per(q)("TAG_local")
      Seq(s"$cat $q", fmt(t), speedup(per(q)("duckdb"), t), speedup(per(q)("spark_sql"), t))
    }
    table(s"Table 3 (repro): selected TPC-H LA/Corr queries at ${TopSf._1} " +
      "(TAG seconds, speedup vs duckdb / spark_sql)",
      Seq("query", "TAG_local", "vs duckdb", "vs spark_sql"), rows)
    // shape: TAG-join beats Spark SQL on every LA / correlated query
    (la ++ corr).foreach { q =>
      assert(per(q)("TAG_local") < per(q)("spark_sql"),
        s"$q: TAG should beat Spark SQL on LA/corr queries (paper: 5x-105x)")
    }
  }

  test("Table 4: GA and scalar queries — runtimes per system") {
    val qs = Seq("q1", "q4", "q6", "q14", "q19")
    table(s"Table 4 (repro): selected TPC-H GA/scalar queries at ${TopSf._1}, seconds",
      Seq("query", "TAG_local", "duckdb", "spark_sql"),
      qs.map(q => Seq(q, fmt(per(q)("TAG_local")), fmt(per(q)("duckdb")), fmt(per(q)("spark_sql")))))
    // paper's shape: GA/scalar is TAG's weakest class — the column-store
    // (DuckDB in the RDBMS-X IM role) wins at least q1 (full-scan GA)
    assert(per("q1")("duckdb") < per("q1")("TAG_local") * 20)
    qs.foreach(q => assert(per(q)("TAG_local") > 0))
  }
}
