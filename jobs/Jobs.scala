package repro.jobs

import repro.bench.BenchHarness._
import repro.core.TagJoinExecutor
import repro.workload.Workload

/** spark-submit entrypoints, one per evaluation-table group. Each prints the
  * reproduced table(s) as markdown (same renderers the bench suites use).
  *
  * Usage: `spark-submit --class repro.jobs.<Name> target/scala-2.13/repro_*.jar`
  * or `sbt "runMain repro.jobs.<Name>"`.
  */
object LoadingJob { // Tables 1, 2
  def main(args: Array[String]): Unit = {
    for ((name, no) <- Seq(("tpch", 1), ("tpcds", 2))) {
      val rows = for ((label, sf) <- Sfs) yield {
        val e = env(name, sf)
        Seq(label, fmt(e.duckLoadSec), fmt(e.sparkCacheSec), fmt(e.tagBuildSec))
      }
      table(s"Table $no: ${name.toUpperCase} loading times, seconds",
        Seq("", "duckdb", "spark_sql", "TAG_local"), rows)
    }
    spark.stop()
  }
}

object TpchJob { // Tables 3, 4, 8-10, 14 (TPC-H half)
  def main(args: Array[String]): Unit = {
    val sw = sweep("tpch")
    val systems = Seq("TAG_local", "spark_sql", "duckdb")
    for (((label, _), no) <- Sfs.zip(Seq(10, 9, 8))) {
      val per = sw(label)
      table(s"Table $no: TPC-H runtimes at $label, seconds", "query" +: systems,
        repro.workload.TpchQueries.queries.map(q =>
          q.name +: systems.map(s => fmt(per(q.name)(s)))))
    }
    table("Table 14 (TPC-H): aggregate, seconds", "" +: Sfs.map(_._1),
      systems.map(s => s +: Sfs.map { case (l, _) => fmt(sw(l).values.map(_(s)).sum) }))
    spark.stop()
  }
}

object TpcdsJob { // Tables 5, 6, 11-13, 14 (TPC-DS half)
  def main(args: Array[String]): Unit = {
    val sw = sweep("tpcds")
    val systems = Seq("TAG_local", "spark_sql", "duckdb")
    for (((label, _), no) <- Sfs.zip(Seq(13, 12, 11))) {
      val per = sw(label)
      table(s"Table $no: TPC-DS runtimes at $label, seconds", "query" +: systems,
        repro.workload.DsQueries.queries.map(q =>
          q.name +: systems.map(s => fmt(per(q.name)(s)))))
    }
    spark.stop()
  }
}

object MemoryJob { // Table 7
  def main(args: Array[String]): Unit = {
    val rows = Seq("tpch", "tpcds").map { name =>
      val e = env(name, TopSf._2)
      use(e)
      val tag = peakHeapFraction(e.wl.queries.foreach(q => Workload.runTag(e.ex, q)))
      val spk = peakHeapFraction(e.wl.queries.foreach(q => spark.sql(q.sql).collect()))
      Seq(name.toUpperCase, f"${tag * 100}%.1f%%", f"${spk * 100}%.1f%%")
    }
    table(s"Table 7: peak heap fraction at ${TopSf._1}", Seq("", "TAG_local", "spark_sql"), rows)
    spark.stop()
  }
}

object DistributedJob { // Tables 16, 17
  def main(args: Array[String]): Unit = {
    val subsets = Seq(
      ("tpch", 16, Seq("q3", "q4", "q14", "q17")),
      ("tpcds", 17, Seq("q84", "q12", "q42", "q98")))
    for ((name, no, subset) <- subsets) {
      val e = env(name, 0.002)
      use(e)
      val distEx = TagJoinExecutor.distributed(spark, e.wl.relationSpecs)
      val rows = subset.map { qn =>
        val q = e.wl.query(qn)
        Workload.runTag(distEx, q) // warm
        val (_, tTag) = time(Workload.runTag(distEx, q))
        spark.sql(q.sql).collect()
        val (_, tSpark) = time(spark.sql(q.sql).collect())
        Seq(qn, fmt(tSpark), fmt(tTag))
      }
      table(s"Table $no: distributed runtimes ($name), seconds",
        Seq("query", "spark_sql", "TAG_dist"), rows)
    }
    spark.stop()
  }
}
