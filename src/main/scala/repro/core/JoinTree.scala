package repro.core

/** A logical join attribute: an equivalence class of equi-joined columns.
  *
  * TAG joins on *values*, not names (§3): the plan attribute node `name`
  * connects to each participating relation via an edge labeled with that
  * relation's own column (`R.cols(R)`), mirroring the paper's `R_b.A` labels.
  */
final case class JoinAttr(name: String, cols: Map[String, String]) extends Serializable {
  def col(rel: String): String = cols(rel)
  def rels: Set[String] = cols.keySet
}

final case class JoinTreeEdge(child: String, parent: String, attr: JoinAttr) extends Serializable

/** A join tree (GHD where every bag is one relation, §5.1): witness of
  * acyclicity, produced by GYO ear removal.
  */
final case class JoinTree(root: String, edges: Seq[JoinTreeEdge]) extends Serializable {
  def relations: Set[String] = edges.flatMap(e => Seq(e.child, e.parent)).toSet + root

  def childrenOf(rel: String): Seq[JoinTreeEdge] = edges.filter(_.parent == rel)

  /** Re-root the tree at `newRoot` by flipping edges on the root path. */
  def rerootAt(newRoot: String): JoinTree = {
    if (newRoot == root) return this
    val parentOf = edges.map(e => e.child -> e).toMap
    var path = List.empty[JoinTreeEdge]
    var cur = newRoot
    while (cur != root) {
      val e = parentOf.getOrElse(cur, sys.error(s"$newRoot not in tree"))
      path ::= e
      cur = e.parent
    }
    val flipped = path.map(e => JoinTreeEdge(e.parent, e.child, e.attr)).toSet
    val kept = edges.filterNot(path.contains)
    JoinTree(newRoot, kept ++ flipped)
  }
}

object JoinTree {

  /** GYO ear removal over the query hypergraph given by `joins`.
    *
    * Returns `Right(joinTree)` when the query is acyclic (rooted at the last
    * surviving relation), or `Left(cyclicCore)` with the relations of the
    * stuck residual hypergraph otherwise (fed to the §6 cyclic machinery).
    */
  def gyo(relations: Seq[String], joins: Seq[JoinAttr]): Either[Seq[String], JoinTree] = {
    var alive = relations.toVector
    // attribute name -> relations currently containing it
    def attrsOf(rel: String): Seq[JoinAttr] = joins.filter(_.cols.contains(rel))
    val edges = Vector.newBuilder[JoinTreeEdge]

    var progress = true
    while (alive.size > 1 && progress) {
      progress = false
      val found = alive.iterator.flatMap { r =>
        // join attrs of r still shared with another alive relation
        val shared = attrsOf(r).filter(a => a.rels.exists(s => s != r && alive.contains(s)))
        if (shared.isEmpty) {
          // disconnected component piece (Cartesian): attach to any survivor later.
          None
        } else {
          // ear: all shared attrs covered by one single other relation
          val candidates = alive.filter(s => s != r && shared.forall(_.cols.contains(s)))
          candidates.headOption.map(s => (r, s, shared))
        }
      }.take(1).toList

      found.foreach { case (ear, witness, shared) =>
        shared.foreach(a => edges += JoinTreeEdge(ear, witness, a))
        alive = alive.filterNot(_ == ear)
        progress = true
      }
    }

    if (alive.size == 1) Right(JoinTree(alive.head, edges.result()))
    else Left(alive)
  }
}
