package repro.workload

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.tag.{Tup, ValueKey}

/** One benchmark query: the TAG-join [[QuerySpec]], the equivalent SQL (run
  * verbatim on Spark SQL and DuckDB), and its paper category.
  *
  * `blocks` supports the WITH-clause union queries of the paper (q56/q60
  * shape): each block is executed as its own TAG-join and the runner unions
  * and re-aggregates (summing) by the outer GROUP BY.
  */
final case class BenchQuery(
    name: String,
    category: String, // "noagg" | "local" | "global" | "scalar" | "corr" | "cycle"
    spec: QuerySpec,
    sql: String,
    cycleTheta: Option[Double] = None,
    blocks: Seq[QuerySpec] = Nil,
)

/** A benchmark workload: tables, the attribute columns materialized as TAG
  * attribute vertices (the loader's choice, §3/§8.2), and the queries.
  */
final case class Workload(
    name: String,
    tables: Map[String, DataFrame],
    attrCols: Map[String, Seq[String]],
    queries: Seq[BenchQuery],
) {
  def relationSpecs: Seq[(String, DataFrame, Seq[String])] =
    tables.toSeq.sortBy(_._1).map { case (n, df) => (n, df, attrCols.getOrElse(n, Nil)) }

  def query(name: String): BenchQuery = queries.find(_.name == name).get
}

object Workload {

  /** Execute a bench query on a TAG-join executor (handles union blocks). */
  def runTag(ex: TagJoinExecutor, q: BenchQuery): QueryResult = {
    if (q.blocks.isEmpty) ex.execute(q.spec, q.cycleTheta)
    else {
      val results = q.blocks.map(b => ex.execute(b))
      // union + re-aggregate (sum) by the outer group-by
      val alias = q.spec.aggs.head.alias
      val all = results.flatMap(_.rows)
      val rows = all.groupBy(r => q.spec.groupBy.map(r.getOrElse(_, null))).map {
        case (key, rs) =>
          val base: Tup = q.spec.groupBy.zip(key).toMap
          base + (alias -> (rs.map(r => ResultCheck.num(r(alias))).sum: Any))
      }.toVector
      QueryResult(rows, q.spec.groupBy ++ Seq(alias), results.flatMap(_.stats).toVector)
    }
  }
}

/** Shared predicate/extraction helpers for writing QuerySpecs over
  * normalized tuples (see [[repro.tag.ValueKey]]).
  */
object Q {
  def lng(t: Tup, c: String): Long = t(c) match {
    case l: Long => l
    case i: Int  => i.toLong
    case other   => other.toString.toLong
  }
  def dbl(t: Tup, c: String): Double = t(c) match {
    case d: Double => d
    case l: Long   => l.toDouble
    case i: Int    => i.toDouble
    case f: Float  => f.toDouble
    case b: java.math.BigDecimal => b.doubleValue
    case other     => other.toString.toDouble
  }
  def str(t: Tup, c: String): String = t(c).asInstanceOf[String]
  def day(t: Tup, c: String): Long = t(c) match {
    case ValueKey.DateKey(d) => d
    case d: java.sql.Date    => d.toLocalDate.toEpochDay
    case other               => sys.error(s"not a date: $c=$other")
  }
  /** Epoch-day of a literal ISO date. */
  def D(s: String): Long = java.time.LocalDate.parse(s).toEpochDay
}

/** Canonical row comparison for result equivalence between any two frames
  * (TAG output vs Spark SQL vs DuckDB): values are compared numerically when
  * numeric (COUNT comes back as long from SQL engines and as double from the
  * TAG aggregator), by string otherwise; row order is ignored.
  */
object ResultCheck {

  def num(v: Any): Double = v match {
    case d: Double               => d
    case f: Float                => f.toDouble
    case l: Long                 => l.toDouble
    case i: Int                  => i.toDouble
    case s: Short                => s.toDouble
    case b: java.math.BigDecimal => b.doubleValue
    case other                   => other.toString.toDouble
  }

  private def canonValue(v: Any): String = v match {
    case null => "∅"
    case _: Double | _: Float | _: java.math.BigDecimal | _: Long | _: Int | _: Short =>
      f"${num(v)}%.6f"
    case d: java.sql.Date => d.toString
    case s: String =>
      // numeric strings (duckdb over varchar tables) normalize numerically
      try { f"${s.toDouble}%.6f" } catch { case _: Exception => s }
    case other => other.toString
  }

  def canonRows(df: DataFrame): Seq[Seq[String]] = {
    val cols = df.columns.toSeq
    val order = cols.map(_.toLowerCase).sorted
    val idx = order.map(c => cols.indexWhere(_.toLowerCase == c))
    df.collect().toSeq.map(r => idx.map(i => canonValue(r.get(i)))).sortBy(_.mkString("|"))
  }

  def assertSame(a: DataFrame, b: DataFrame, context: String = ""): Unit = {
    require(a.columns.map(_.toLowerCase).sorted.toSeq == b.columns.map(_.toLowerCase).sorted.toSeq,
      s"$context column mismatch: ${a.columns.toSeq.sorted} vs ${b.columns.toSeq.sorted}")
    val ca = canonRows(a)
    val cb = canonRows(b)
    require(ca == cb,
      s"$context result mismatch (${ca.size} vs ${cb.size} rows)\n" +
        s"  only-left:  ${ca.diff(cb).take(3)}\n" +
        s"  only-right: ${cb.diff(ca).take(3)}")
  }
}
