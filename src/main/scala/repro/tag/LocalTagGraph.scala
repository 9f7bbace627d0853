package repro.tag

import repro.bsp.{OutEdge, VertexInfo}

/** In-memory CSR representation of a TAG graph (§3), the substrate for the
  * shared-memory BSP engine (the paper's single-server TigerGraph setting).
  *
  * Vertices `0 until numVertices`; tuple vertices carry their tuple, attribute
  * vertices their normalized value. Undirected TAG edges are materialized as
  * two directed edges so a standard vertex-centric program can message in
  * both directions (§3 footnote 3).
  */
final class LocalTagGraph(
    val numVertices: Int,
    val vertexLabel: Array[String],      // relation name, or "#attr" for attribute vertices
    val isTuple: Array[Boolean],
    val tupleData: Array[Tup],           // null for attribute vertices
    val attrValue: Array[Any],           // null for tuple vertices
    val edgeOffsets: Array[Int],         // CSR offsets, length numVertices+1
    val edgeDst: Array[Int],
    val edgeLabelId: Array[Int],
    val labelNames: Array[String],       // edge label id → "R.A"
) extends Serializable {

  val labelIds: Map[String, Int] = labelNames.zipWithIndex.toMap

  def numEdges: Int = edgeDst.length

  def info(v: Int): VertexInfo =
    VertexInfo(v.toLong, vertexLabel(v), isTuple(v), tupleData(v), attrValue(v))

  def degree(v: Int): Int = edgeOffsets(v + 1) - edgeOffsets(v)

  /** Out-edges of `v` as the program-facing view. */
  def outEdges(v: Int): IndexedSeq[OutEdge] = new scala.collection.immutable.IndexedSeq[OutEdge] {
    private val off = edgeOffsets(v)
    val length: Int = edgeOffsets(v + 1) - off
    def apply(i: Int): OutEdge = OutEdge(edgeDst(off + i).toLong, labelNames(edgeLabelId(off + i)))
  }

  /** Number of out-edges of `v` with the given label — the degree an
    * attribute vertex reads locally for the §6 heavy/light test.
    */
  def degreeByLabel(v: Int, label: String): Int = labelIds.get(label) match {
    case None => 0
    case Some(lid) =>
      var c = 0
      var i = edgeOffsets(v)
      while (i < edgeOffsets(v + 1)) { if (edgeLabelId(i) == lid) c += 1; i += 1 }
      c
  }

  /** Vertex ids of attribute vertices, keyed by normalized value. */
  lazy val attrIndex: Map[Any, Int] =
    (0 until numVertices).iterator.filterNot(isTuple(_)).map(v => attrValue(v) -> v).toMap
}
