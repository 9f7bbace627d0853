package repro.core

import repro.bsp.{BspEngine, LocalBspEngine}
import repro.tag._

/** Tiny literal test databases without Spark: build TAG relations, graphs,
  * engines and executors from inline rows, plus a brute-force reference
  * evaluator to check join results against.
  */
object TestDb {

  def rel(name: String, cols: Seq[String], attrCols: Seq[String], rows: Seq[Seq[Any]]): TagRelation =
    TagRelation(
      name,
      rows.zipWithIndex.map { case (r, i) =>
        cols.zip(r.map(ValueKey.normalize)).toMap + (ridCol(name) -> (i.toLong: Any))
      }.toIndexedSeq,
      attrCols)

  def graph(rels: TagRelation*): LocalTagGraph = TagGraphBuilder.local(rels)

  def engine(rels: TagRelation*): LocalBspEngine = new LocalBspEngine(graph(rels: _*))

  def executor(rels: TagRelation*): TagJoinExecutor =
    new TagJoinExecutor(rels, rs => new LocalBspEngine(TagGraphBuilder.local(rs)))

  /** Brute-force natural join on explicit join attributes (reference). */
  def refJoin(rels: Seq[TagRelation], joins: Seq[JoinAttr],
      filters: Map[String, Tup => Boolean] = Map.empty): Vector[Tup] = {
    def rows(r: TagRelation): Vector[Tup] =
      r.rows.toVector.filter(t => filters.get(r.name).forall(_(t)))
    rels.map(r => (r.name, rows(r))).foldLeft(Vector(Map.empty[String, Any]): Vector[Tup]) {
      case (acc, (name, rs)) =>
        for {
          a <- acc
          b <- rs
          if joins.forall { j =>
            (j.cols.get(name), j.cols.collect { case (rn, c) if rn != name && a.contains(c) => a(c) }) match {
              case (Some(myCol), prior) if prior.nonEmpty => prior.forall(_ == b(myCol))
              case _                                      => true
            }
          }
        } yield a ++ b
    }
  }

  /** Strip hidden rid columns for comparisons. */
  def clean(rows: Vector[Tup]): Vector[Tup] =
    rows.map(_.filterNot { case (k, _) => isRidCol(k) })

  /** Multiset comparison of row bags. */
  def sameBag(a: Vector[Tup], b: Vector[Tup]): Boolean = {
    def canon(rows: Vector[Tup]): Map[Map[String, String], Int] =
      rows.map(_.map { case (k, v) => k -> String.valueOf(v) }).groupBy(identity).view.mapValues(_.size).toMap
    canon(a) == canon(b)
  }
}
