package repro.core

/** One crossing-edge mapping of an LPM: query edge `edge` is matched by the
  * data edge `su --p--> ou` (a crossing edge of the fragment). This is one
  * entry of the LEC feature's function `g` (Def. 8).
  */
final case class Cross(edge: Int, su: Long, p: Long, ou: Long)

/** A serialized local partial match (Def. 5) — or, when `sign` is the full
  * mask and `cross` is empty, a complete match found entirely inside one
  * fragment (all query vertices map to internal vertices).
  *
  * @param frag  fragment the match was computed in
  * @param bind  `bind(i)` = data vertex matched by query vertex i, -1 = NULL
  * @param sign  LECSign: bit i set iff query vertex i maps to an internal
  *              vertex of `frag`
  * @param cross crossing-edge mappings, sorted by (edge, su, p, ou)
  */
final case class PMRow(frag: Int, bind: Seq[Long], sign: Long, cross: Seq[Cross]) {
  def isCompleteLocal(fullMask: Long): Boolean = sign == fullMask && cross.isEmpty
}

object PMRow {
  val NULL: Long = -1L
}
