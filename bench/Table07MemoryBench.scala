package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.workload.Workload

/** Table 7 — peak RAM during workload execution at the top SF, as a fraction
  * of available memory (paper: smem over /proc; here: sampled JVM used-heap
  * over max-heap, DESIGN.md substitution #7). The shape to preserve: all
  * systems sit in the same band, no system using a game-changing multiple.
  */
class Table07MemoryBench extends AnyFunSuite {
  import BenchHarness._

  private def measure(name: String): (Double, Double) = {
    val e = env(name, TopSf._2)
    use(e)
    System.gc()
    val tagPeak = peakHeapFraction {
      e.wl.queries.foreach(q => Workload.runTag(e.ex, q))
    }
    System.gc()
    val sparkPeak = peakHeapFraction {
      e.wl.queries.foreach(q => spark.sql(q.sql).collect())
    }
    (tagPeak, sparkPeak)
  }

  test("Table 7: peak heap usage during TPC-H and TPC-DS workloads") {
    val (ht, hs) = measure("tpch")
    val (dt, ds) = measure("tpcds")
    table(s"Table 7 (repro): peak JVM heap fraction during workload execution at ${TopSf._1}",
      Seq("", "TAG_local", "spark_sql"),
      Seq(Seq("TPC-H", f"${ht * 100}%.1f%%", f"${hs * 100}%.1f%%"),
          Seq("TPC-DS", f"${dt * 100}%.1f%%", f"${ds * 100}%.1f%%")))
    // both inside the heap, same ballpark (paper: 43%-68% across systems)
    Seq(ht, hs, dt, ds).foreach(p => assert(p > 0 && p < 1))
  }
}
