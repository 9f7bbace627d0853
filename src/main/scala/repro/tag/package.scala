package repro

package object tag {

  /** A relational tuple as carried by a tuple vertex: attribute name → value.
    * Values are normalized via [[tag.ValueKey.normalize]] so that equal join
    * values compare equal across relations and SQL types.
    */
  type Tup = Map[String, Any]

  /** Hidden per-tuple row-id attribute for relation `rel`. Row-ids make the
    * collection phase's natural joins exact under bag semantics (§5.2): each
    * tuple vertex contributes a unique `\$rid` column, so re-joining a partial
    * result with the vertex's own tuple selects precisely its own rows.
    */
  def ridCol(rel: String): String = s"$$rid_$rel"

  def isRidCol(c: String): Boolean = c.startsWith("$rid_")
}
