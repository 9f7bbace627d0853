package repro.bench

import java.nio.file.{Files, Path}
import org.scalatest.funsuite.AnyFunSuite

/** Table 15 — size of the in-memory column store vs raw data size (paper:
  * RDBMS-X IM segments vs on-disk data). Here: Spark's cached columnar
  * in-memory relation size vs raw CSV bytes of the same tables (DESIGN.md
  * substitution — the quantity of interest is the compression ratio of the
  * columnar in-memory format, which the paper reports as ~0.7x).
  */
class Table15StorageBench extends AnyFunSuite {
  import BenchHarness._

  private def dirBytes(p: Path): Long =
    Files.walk(p).filter(Files.isRegularFile(_)).mapToLong(Files.size(_)).sum()

  private def measure(name: String): (Long, Long) = {
    val e = env(name, TopSf._2)
    use(e)
    // raw size: CSV dump of all tables
    val tmp = Files.createTempDirectory(s"raw_$name")
    var raw = 0L
    e.wl.tables.foreach { case (t, df) =>
      val out = tmp.resolve(t)
      df.coalesce(1).write.option("header", "false").csv(out.toString)
      raw += dirBytes(out)
    }
    // in-memory size: cached columnar storage of the same tables
    e.wl.tables.values.foreach(_.count()) // ensure fully cached
    val mem = spark.sparkContext.getRDDStorageInfo.map(_.memSize).sum
    (raw, mem)
  }

  test("Table 15: raw data size vs in-memory columnar size") {
    val (rawH, memH) = measure("tpch")
    table(s"Table 15 (repro): data size vs in-memory columnar size at ${TopSf._1}, MB",
      Seq("", "raw csv", "spark in-memory columnar", "ratio"),
      Seq(Seq("TPC-H (+TPC-DS cached)", f"${rawH / 1e6}%.1f", f"${memH / 1e6}%.1f",
        f"${memH.toDouble / rawH}%.2f")))
    assert(rawH > 0 && memH > 0)
    // columnar in-memory representation is comparable to raw size
    // (paper: IM store ≈ 0.7x of raw)
    assert(memH < rawH * 5)
  }
}
