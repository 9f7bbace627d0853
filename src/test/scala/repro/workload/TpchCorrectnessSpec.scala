package repro.workload

import repro.{Oracle, SparkSpec}
import repro.core.TagJoinExecutor

/** Every TPC-H-lite query: TAG-join output ≡ Spark SQL (Catalyst) output,
  * and the shared SQL ≡ DuckDB (so the baseline itself is oracle-checked).
  */
class TpchCorrectnessSpec extends SparkSpec {

  private lazy val wl = TpchQueries.workload(spark, 0.002)
  private lazy val ex: TagJoinExecutor = {
    wl.tables.foreach { case (n, df) => df.cache().createOrReplaceTempView(n) }
    TagJoinExecutor.local(wl.relationSpecs)
  }

  for (q <- TpchQueries.queries) {
    test(s"TPC-H ${q.name} (${q.category}): TAG-join matches Spark SQL") {
      val tag = Workload.runTag(ex, q).toDF(spark)
      ResultCheck.assertSame(tag, spark.sql(q.sql), q.name)
    }
  }

  for (qn <- Seq("q1", "q3", "q6", "q12", "q14", "q17", "q19")) {
    test(s"TPC-H $qn: Spark SQL matches the DuckDB oracle") {
      ex // force temp-view registration
      val q = wl.query(qn)
      val needed = q.spec.relations match {
        case Nil  => wl.tables.keys.toSeq
        case rels => rels
      }
      Oracle.assertEquivalent(spark.sql(q.sql), q.sql,
        needed.map(n => n -> wl.tables(n)): _*)
    }
  }

  test("TPC-H q5 result is non-trivial (cycle machinery actually ran)") {
    val r = Workload.runTag(ex, wl.query("q5"))
    assert(r.rows.nonEmpty)
    assert(r.stats.size >= 2) // cycle pass + residual acyclic pass
  }

  test("TPC-H q4 semijoin reduction uses the bottom-up pass only") {
    val r = Workload.runTag(ex, wl.query("q4"))
    // schedule has 2 labels; semijoin-only runs UP + final = few supersteps
    assert(r.stats.head.supersteps <= 5)
  }

  test("TPC-H reduction communication is bounded by graph size (§5.2.1)") {
    val r = Workload.runTag(ex, wl.query("q3"))
    val in = wl.tables("lineitem").count() + wl.tables("orders").count() +
      wl.tables("customer").count()
    // each superstep sends at most O(IN) messages
    assert(r.stats.head.messagesPerStep.forall(_ <= 3 * in))
  }
}
