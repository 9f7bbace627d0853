package repro.core

import repro.bsp._
import repro.core.RowTable.Table
import repro.tag.{ridCol, Tup}

/** Messages of the acyclic TAG-join vertex program (Algorithm 2 + §7). */
sealed trait JoinMsg extends Serializable
object JoinMsg {
  /** Reduction phase: sender ids (edge identification, Alg. 2 lines 8–9). */
  final case class Ids(senders: List[Long]) extends JoinMsg
  /** Collection phase: partial join tables keyed by origin tag. */
  final case class Tables(byTag: Map[String, Table]) extends JoinMsg
  /** Correlated pre-phase: value accumulator towards a per-group average. */
  final case class Corr(cell: AggCell) extends JoinMsg
  /** Correlated pre-phase keep-alive self message (see AcyclicJoinProgram). */
  case object Ping extends JoinMsg
  /** GA/scalar partial aggregates, addressed to the aggregator vertex. */
  final case class Agg(p: Partials) extends JoinMsg

  def merge(a: JoinMsg, b: JoinMsg): JoinMsg = (a, b) match {
    case (Ids(x), Ids(y)) => Ids(x ++ y)
    case (Tables(x), Tables(y)) =>
      Tables(y.foldLeft(x) { case (m, (k, t)) => m.updated(k, m.getOrElse(k, Vector.empty) ++ t) })
    case (Corr(x), Corr(y)) => Corr(x.merge(y))
    case (Agg(x), Agg(y))   => Agg(x.merge(y))
    case (Ping, Ping)       => Ping
    case (Ping, o)          => o // keep-alive never shadows real traffic
    case (o, Ping)          => o
    case _                  => sys.error(s"phase-mixed messages cannot meet: $a / $b")
  }
}

/** Per-vertex state of Algorithm 2. */
final case class JState(
    marked: Set[(Long, String)] = Set.empty, // (neighbor id, edge label) marks
    value: Table = Vector.empty,             // collection-phase partial table
    thresh: Double = Double.NaN,             // correlated threshold (attribute vertices)
    output: Table = Vector.empty,            // final result slice (root vertices)
) extends Serializable

/** The acyclic TAG-join vertex program: Yannakakis-style reduction (connected
  * bottom-up pass, then top-down pass over marked edges) followed by a
  * bottom-up collection pass whose messages carry partial join tables —
  * Algorithm 2 of the paper, extended with the §7 features (pushed
  * selections/projections, LA/GA/scalar aggregation, correlated averages,
  * semijoin-only mode).
  */
final class AcyclicJoinProgram(
    val plan: TagPlan,
    val spec: QuerySpec,
) extends VertexProgram[JState, JoinMsg] {
  import JoinMsg._

  private val up: Vector[TraversalStep] = plan.steps
  private val L = up.length
  /** Full driving schedule: UP ++ DOWN(reversed) ++ COLLECT(UP again);
    * semijoin-only queries stop after the bottom-up reduction pass.
    */
  val full: Vector[TraversalStep] =
    if (spec.semiJoinOnly) up else up ++ up.reverse ++ up
  private val preSteps = if (spec.correlated.isDefined) 2 else 0
  private val lastIdx = full.length // final (receive-only) schedule index

  override val maxSteps: Int = preSteps + lastIdx + 2

  private val joinByName: Map[String, JoinAttr] = spec.joins.map(j => j.name -> j).toMap
  private val corrLabel: Option[String] = spec.correlated.map { c =>
    val j = joinByName(c.attrName)
    s"${c.rel}.${j.col(c.rel)}"
  }

  private def tupleOk(v: VertexInfo): Boolean =
    spec.tupleFilter.get(v.label).forall(_(v.tuple))

  private def projected(v: VertexInfo): Tup = {
    val keep = spec.carry.getOrElse(v.label, Nil).toSet + ridCol(v.label)
    v.tuple.view.filterKeys(keep).toMap
  }

  override def initialState(v: VertexInfo): JState = JState()

  override def initiallyActive(v: VertexInfo, s: JState, edges: IndexedSeq[OutEdge]): Boolean =
    v.isTuple && tupleOk(v) &&
      (v.label == plan.startRel || spec.correlated.exists(_.rel == v.label))

  override def merge(a: JoinMsg, b: JoinMsg): JoinMsg = JoinMsg.merge(a, b)

  override def compute(step: Int, v: VertexInfo, s: JState, msg: Option[JoinMsg],
      edges: IndexedSeq[OutEdge], ctx: SendCtx[JoinMsg]): JState = {

    // ---------------------------------------------------- correlated pre-phase
    if (step < preSteps) {
      msg match {
        case None => // step 0 initial actives
          if (v.label == spec.correlated.get.rel && step == 0)
            edges.foreach { e =>
              if (corrLabel.contains(e.label))
                ctx.send(e.dst, Corr(AggCell.zero.add(spec.correlated.get.valueExpr(v.tuple))))
            }
          if (v.label == plan.startRel) ctx.send(v.id, Ping) // stay warm
          s
        case Some(Ping) =>
          if (v.label == plan.startRel) ctx.send(v.id, Ping)
          s
        case Some(Corr(cell)) =>
          // group-key attribute vertex stores its threshold (§7 q17 pattern)
          s.copy(thresh = spec.correlated.get.factor * cell.result(AggFunc.Avg))
        case _ => s
      }
    } else {
      val schedIdx = step - preSteps

      // -------------------------------------------------------------- receive
      var st = s
      var validated = msg.isEmpty // initially-active vertices are pre-validated
      msg match {
        case None => validated = true
        case Some(Ping) => validated = true // tail of the pre-phase keep-alive
        case Some(Ids(senders)) =>
          val prev = full(schedIdx - 1)
          val ok =
            if (v.isTuple) v.label == prev.rel && tupleOk(v)
            else spec.attrFilter.get(prev.attrName).forall(_(v.value))
          if (ok) {
            st = st.copy(marked = st.marked ++ senders.iterator.map(id => (id, prev.label)))
            validated = true
            if (spec.semiJoinOnly && schedIdx == lastIdx) st = finishUp(v, st)
          }
        case Some(Tables(byTag)) =>
          val prev = full(schedIdx - 1)
          var value = RowTable.naturalJoinAll(byTag.valuesIterator.toSeq)
          if (v.isTuple) value = RowTable.naturalJoin(value, Vector(projected(v)))
          else spec.correlated.foreach { c =>
            if (c.attrName == prev.attrName) {
              val col = ridCol(c.rel)
              value = value.filter(r => !r.contains(col) || c.keep(c.valueExpr(r), st.thresh))
            }
          }
          st = st.copy(value = value)
          validated = true
          if (schedIdx == lastIdx) st = finishUp(v, st)
        case Some(other) => sys.error(s"unexpected $other at step $step")
      }
      if (!validated) return st

      // ----------------------------------------------------------------- send
      if (schedIdx == lastIdx) {
        if (spec.aggMode == AggMode.Global || spec.aggMode == AggMode.Scalar) {
          val rows0: Table = if (spec.semiJoinOnly) Vector(projected(v)) else st.value
          val rows = spec.postFilter.fold(rows0)(rows0.filter)
          if (rows.nonEmpty)
            ctx.send(VertexProgram.AggregatorId,
              Agg(Partials.ofRows(rows, spec.groupBy, spec.aggs)))
        }
        return st
      }
      val cur = full(schedIdx)
      if (schedIdx < L) {
        // bottom-up reduction: message every matching edge (Alg. 2 lines 11-13)
        edges.foreach(e => if (e.label == cur.label) ctx.send(e.dst, Ids(List(v.id))))
      } else if (schedIdx < 2 * L && !spec.semiJoinOnly) {
        // top-down reduction: only via marked edges (lines 15-18)
        edges.foreach { e =>
          if (e.label == cur.label && st.marked((e.dst, e.label)))
            ctx.send(e.dst, Ids(List(v.id)))
        }
      } else {
        // collection: partial tables via marked edges (lines 37-40)
        val table: Table =
          if (schedIdx == 2 * L) Vector(projected(v)) // start leaf initiates
          else st.value
        if (table.nonEmpty) {
          val m = Tables(Map(s"${v.label}" -> table))
          edges.foreach { e =>
            if (e.label == cur.label && st.marked((e.dst, e.label))) ctx.send(e.dst, m)
          }
        }
      }
      st
    }
  }

  /** Wrap up at the last superstep: emit output rows / LA aggregates. */
  private def finishUp(v: VertexInfo, s0: JState): JState = {
    if (spec.semiJoinOnly)
      return s0.copy(value = Vector(projected(v)), output = Vector(projected(v)))
    val s = spec.postFilter.fold(s0)(p => s0.copy(value = s0.value.filter(p)))
    spec.aggMode match {
      case AggMode.NoAgg =>
        s.copy(output = s.value.map(_.filterNot { case (k, _) => repro.tag.isRidCol(k) }))
      case AggMode.Local =>
        // Group-key attribute vertex aggregates its own group (§7 LA).
        val laName = spec.laAttr.get
        val others = spec.groupBy.filterNot(_ == laName)
        val out = s.value.groupBy(r => others.map(r.getOrElse(_, null))).map {
          case (key, rows) =>
            val cells = Partials.ofRows(rows, Nil, spec.aggs).groups
              .getOrElse(Vector(), Vector.fill(spec.aggs.size)(AggCell.zero))
            val base: Tup = Map(laName -> v.value) ++ others.zip(key).toMap
            base ++ spec.aggs.zip(cells).map { case (a, c) =>
              a.alias -> (a.finish(c.result(a.func)): Any)
            }
        }.toVector
        s.copy(output = out)
      case AggMode.Global | AggMode.Scalar => s // partials sent from compute
    }
  }
}
