package repro.core

import repro.tag.Tup

/** A generic aggregation accumulator cell: enough state for SUM, COUNT, AVG,
  * MIN and MAX at once (one cell per [[AggSpec]]).
  */
final case class AggCell(sum: Double, count: Long, min: Double, max: Double) extends Serializable {
  def add(v: Double): AggCell =
    AggCell(sum + v, count + 1, math.min(min, v), math.max(max, v))
  def merge(o: AggCell): AggCell =
    AggCell(sum + o.sum, count + o.count, math.min(min, o.min), math.max(max, o.max))
  def result(f: AggFunc): Double = f match {
    case AggFunc.Sum   => sum
    case AggFunc.Count => count.toDouble
    case AggFunc.Avg   => if (count == 0) Double.NaN else sum / count
    case AggFunc.Min   => min
    case AggFunc.Max   => max
  }
}

object AggCell {
  val zero: AggCell = AggCell(0.0, 0L, Double.PositiveInfinity, Double.NegativeInfinity)
}

/** Grouped partial aggregates, the payload vertices send to the global
  * aggregator vertex for GA/scalar aggregation (§7).
  */
final case class Partials(groups: Map[Vector[Any], Vector[AggCell]]) extends Serializable {
  def merge(o: Partials): Partials = {
    val m = scala.collection.mutable.Map.from(groups)
    o.groups.foreach { case (k, cells) =>
      m.updateWith(k) {
        case Some(prev) => Some(prev.lazyZip(cells).map(_ merge _).toVector)
        case None       => Some(cells)
      }
    }
    Partials(m.toMap)
  }
}

object Partials {
  val empty: Partials = Partials(Map.empty)

  /** Accumulate `rows` into grouped cells for `aggs`, grouping by `groupBy`. */
  def ofRows(rows: Iterable[Tup], groupBy: Seq[String], aggs: Seq[AggSpec]): Partials = {
    val m = scala.collection.mutable.Map.empty[Vector[Any], Array[AggCell]]
    rows.foreach { r =>
      val key = groupBy.map(g => r.getOrElse(g, null)).toVector
      val cells = m.getOrElseUpdate(key, Array.fill(aggs.size)(AggCell.zero))
      var i = 0
      while (i < aggs.size) { cells(i) = cells(i).add(aggs(i).expr(r)); i += 1 }
    }
    Partials(m.view.mapValues(_.toVector).toMap)
  }
}
