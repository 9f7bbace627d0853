package repro.workload

import repro.{Oracle, SparkSpec}
import repro.core.TagJoinExecutor

/** Every TPC-DS-lite query: TAG-join output ≡ Spark SQL output; selected
  * queries additionally oracle-checked on DuckDB.
  */
class DsCorrectnessSpec extends SparkSpec {

  private lazy val wl = DsQueries.workload(spark, 0.003)
  private lazy val ex: TagJoinExecutor = {
    wl.tables.foreach { case (n, df) => df.cache().createOrReplaceTempView(n) }
    TagJoinExecutor.local(wl.relationSpecs)
  }

  for (q <- DsQueries.queries) {
    test(s"TPC-DS ${q.name} (${q.category}): TAG-join matches Spark SQL") {
      ex
      val tag = Workload.runTag(ex, q).toDF(spark)
      ResultCheck.assertSame(tag, spark.sql(q.sql), q.name)
    }
  }

  for (qn <- Seq("q3", "q7", "q32", "q37", "q84", "q94", "q98")) {
    test(s"TPC-DS $qn: Spark SQL matches the DuckDB oracle") {
      ex
      val q = wl.query(qn)
      val needed =
        if (q.spec.relations.nonEmpty) q.spec.relations
        else q.blocks.flatMap(_.relations).distinct
      Oracle.assertEquivalent(spark.sql(q.sql), q.sql,
        needed.map(n => n -> wl.tables(n)): _*)
    }
  }

  test("TPC-DS union-block queries run one TAG pass per block") {
    val r = Workload.runTag(ex, wl.query("q56"))
    assert(r.stats.size == 3)
  }

  test("TPC-DS LA queries produce one output row per surviving group") {
    val r = Workload.runTag(ex, wl.query("q7"))
    assert(r.rows.map(_("i_item_id")).distinct.size == r.rows.size)
  }
}
