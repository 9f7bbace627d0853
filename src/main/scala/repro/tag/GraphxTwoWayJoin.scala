package repro.tag

import org.apache.spark.graphx._
import repro.bsp.VertexInfo
import repro.core.{RowTable, TwoWaySpec}

/** The §4.1 two-way join written *directly* against GraphX's vertex-centric
  * primitives (`aggregateMessages` supersteps over the TAG graph), proving
  * the scheme runs unchanged on a stock vertex-centric engine — the
  * portability claim of the paper's introduction ("applicability on top of
  * vertex-centric platforms without having to change their internals").
  *
  * Superstep 1: every join-attribute vertex learns its incident edge labels
  * (local data in the abstract model; one aggregateMessages round in GraphX)
  * and decides whether it is a join value. Superstep 2: joining tuple
  * vertices are signalled and reply with their projected tuples. Superstep
  * 3: the attribute vertex combines both sides.
  */
object GraphxTwoWayJoin {

  def run(g: Graph[VertexInfo, String], spec: TwoWaySpec): Vector[Tup] = {
    val lr = s"${spec.relR}.${spec.join.col(spec.relR)}"
    val ls = s"${spec.relS}.${spec.join.col(spec.relS)}"
    val carry = spec.carry
    val filters = spec.tupleFilter

    // Superstep 1a: each vertex's incident edge labels (vertex-local info).
    val labels: VertexRDD[Set[String]] =
      g.aggregateMessages[Set[String]](ctx => ctx.sendToDst(Set(ctx.attr)), _ ++ _)

    // join-value attribute vertices: both sides present (§4.1 superstep 1)
    val g1 = g.outerJoinVertices(labels) { (_, info, ls0) => (info, ls0.getOrElse(Set.empty)) }

    // Superstep 1b→2: signal tuples of both relations via matching edges;
    // tuple vertices reply with their projected tuple (§4.1 superstep 2).
    val replies: VertexRDD[Map[String, Vector[Tup]]] = g1.aggregateMessages[Map[String, Vector[Tup]]](
      ctx => {
        val (src, srcLabels) = ctx.srcAttr
        val (dst, _) = ctx.dstAttr
        // src is a join-value attribute vertex iff it has both labels
        if (!src.isTuple && srcLabels(lr) && srcLabels(ls) &&
            (ctx.attr == lr || ctx.attr == ls)) {
          // the "reply" is computable in the same round because the tuple's
          // data is on the triplet; semantically this is the tuple vertex's
          // superstep-2 answer routed back to the signalling attribute vertex
          if (filters.get(dst.label).forall(_(dst.tuple))) {
            val joinCols = (spec.join +: spec.others).flatMap(_.cols.get(dst.label))
            val keep = carry.getOrElse(dst.label, Nil).toSet ++ joinCols + ridCol(dst.label)
            ctx.sendToSrc(Map(dst.label -> Vector(dst.tuple.view.filterKeys(keep).toMap)))
          }
        }
      },
      (a, b) => b.foldLeft(a) { case (m, (k, v)) => m.updated(k, m.getOrElse(k, Vector.empty) ++ v) })

    // Superstep 3: combine at the attribute vertices (§4.1 superstep 3).
    replies.flatMap { case (_, byRel) =>
      val r = byRel.getOrElse(spec.relR, Vector.empty)
      val s = byRel.getOrElse(spec.relS, Vector.empty)
      RowTable.naturalJoin(r, s)
    }.collect().toVector.map(_.filterNot { case (k, _) => isRidCol(k) })
  }
}
