package repro.bench

import org.apache.spark.scheduler.{SparkListener, SparkListenerStageCompleted}
import org.apache.spark.sql.SparkSession
import repro.core.TagJoinExecutor
import repro.workload._

import scala.collection.mutable

/** Shared benchmark harness for the evaluation-table reproductions.
  *
  * Scale-factor mapping (DESIGN.md substitution #2): the paper's SF-30/50/75
  * (GB) become SF 0.005 / 0.01 / 0.02 of our synthetic generators — we
  * compare *shapes* (who wins, by roughly what factor), not absolute times.
  *
  * Methodology (substitution #9): 1 warm-up run + `TimedRuns` timed runs per
  * query per system, reporting the average, mirroring §8.1.5.
  */
object BenchHarness {

  val Sfs: Seq[(String, Double)] = Seq("SF-30" -> 0.005, "SF-50" -> 0.01, "SF-75" -> 0.02)
  val TopSf: (String, Double) = Sfs.last
  val TimedRuns = 3

  /** Same configuration as the test harness's shared session; `getOrCreate`
    * reuses the session when benches run inside the test JVM.
    */
  lazy val spark: SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-bench")
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  /** A loaded benchmark environment: Spark temp views + cached tables, the
    * TAG executor (graph built once, query-independent), and a typed DuckDB.
    */
  final case class Env(
      wl: Workload,
      ex: TagJoinExecutor,
      duck: DuckDb,
      tagBuildSec: Double,
      duckLoadSec: Double,
      sparkCacheSec: Double,
  )

  private val envs = mutable.Map.empty[(String, Double), Env]

  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  private def indexCols(wl: Workload, t: String): Seq[String] =
    wl.attrCols.getOrElse(t, Nil).filter(c => c.endsWith("key") || c.endsWith("_sk"))

  def env(name: String, sf: Double): Env = synchronized {
    envs.getOrElseUpdate((name, sf), {
      val wl = if (name == "tpch") TpchQueries.workload(spark, sf) else DsQueries.workload(spark, sf)
      // Spark side: cache + register views (its "load")
      val (_, sparkSec) = time {
        wl.tables.foreach { case (n, df) =>
          df.cache().createOrReplaceTempView(n)
          df.count()
        }
      }
      // DuckDB side: typed tables + key indexes (the RDBMS load of Tables 1/2)
      val duck = new DuckDb
      val (_, duckSec) = time {
        wl.tables.foreach { case (n, df) => duck.load(n, df, indexCols(wl, n)) }
      }
      // TAG side: encode the database as a TAG graph (no extra indexes, §3)
      val (ex, tagSec) = time {
        val e = TagJoinExecutor.local(wl.relationSpecs)
        e.baseEngine // force graph construction
        e
      }
      Console.err.println(f"[bench] env $name sf=$sf loaded: spark=$sparkSec%.2fs duckdb=$duckSec%.2fs tag=$tagSec%.2fs")
      Env(wl, ex, duck, tagSec, duckSec, sparkSec)
    })
  }

  /** (Re-)register an env's temp views. TPC-H and TPC-DS share table names
    * (`customer`), and env creation for another workload/SF overwrites them —
    * call this before running Spark SQL against an env.
    */
  def use(e: Env): Unit =
    e.wl.tables.foreach { case (n, df) => df.createOrReplaceTempView(n) }

  /** Average seconds over TimedRuns after one warm-up. */
  private def timed(run: () => Unit): Double = {
    run()
    val ts = (1 to TimedRuns).map { _ => time(run())._2 }
    ts.sum / ts.size
  }

  /** One query on all three systems → seconds by system name. */
  def runQuery(e: Env, q: BenchQuery): Map[String, Double] = {
    use(e)
    Map(
    "TAG_local" -> timed(() => Workload.runTag(e.ex, q)),
    "spark_sql" -> timed(() => { spark.sql(q.sql).collect(); () }),
    "duckdb"    -> timed(() => { e.duck.run(q.sql); () }),
    )
  }

  // ------------------------------------------------------------- formatting

  /** Render rows as a markdown table and echo to stdout (tee'd into
    * bench_output.txt); EXPERIMENTS.md carries the paper-side numbers.
    */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb.append(s"\n### $title\n\n")
    sb.append(header.mkString("| ", " | ", " |\n"))
    sb.append(header.map(_ => "---").mkString("| ", " | ", " |\n"))
    rows.foreach(r => sb.append(r.mkString("| ", " | ", " |\n")))
    val s = sb.toString
    println(s)
    s
  }

  def fmt(d: Double): String = if (d >= 100) f"$d%.1f" else if (d >= 1) f"$d%.2f" else f"$d%.3f"
  def speedup(base: Double, mine: Double): String = f"${base / mine}%.1fx"

  // --------------------------------------------- full per-workload sweeps

  /** name -> (sfLabel -> (query -> system -> seconds)); computed lazily and
    * cached so the per-table suites share one sweep.
    */
  private val sweeps = mutable.Map.empty[String, Map[String, Map[String, Map[String, Double]]]]

  def sweep(name: String): Map[String, Map[String, Map[String, Double]]] = synchronized {
    sweeps.getOrElseUpdate(name, {
      Sfs.map { case (label, sf) =>
        val e = env(name, sf)
        val per = e.wl.queries.map { q =>
          val r = runQuery(e, q)
          Console.err.println(f"[bench] $name $label ${q.name}: " +
            r.toSeq.sortBy(_._1).map { case (s, t) => f"$s=${t}%.3fs" }.mkString(" "))
          q.name -> r
        }.toMap
        label -> per
      }.toMap
    })
  }

  /** Shuffle bytes (read+write) measured over `f` — the Fig. 9(b) analog. */
  def shuffleBytes(f: => Unit): Long = {
    var total = 0L
    val listener = new SparkListener {
      override def onStageCompleted(sc: SparkListenerStageCompleted): Unit = {
        val m = sc.stageInfo.taskMetrics
        if (m != null)
          total += m.shuffleReadMetrics.totalBytesRead + m.shuffleWriteMetrics.bytesWritten
      }
    }
    spark.sparkContext.addSparkListener(listener)
    try { f; Thread.sleep(300) /* let the listener bus drain */ }
    finally spark.sparkContext.removeSparkListener(listener)
    total
  }

  /** Peak used-heap fraction while `f` runs, sampled at 50 ms (Table 7). */
  def peakHeapFraction(f: => Unit): Double = {
    val rt = Runtime.getRuntime
    @volatile var peak = 0L
    @volatile var stop = false
    val t = new Thread(() => {
      while (!stop) {
        peak = math.max(peak, rt.totalMemory() - rt.freeMemory())
        Thread.sleep(50)
      }
    })
    t.setDaemon(true); t.start()
    try f finally { stop = true; t.join(1000) }
    peak.toDouble / rt.maxMemory()
  }
}
