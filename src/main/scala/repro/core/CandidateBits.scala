package repro.core

/** Fixed-length candidate bit vectors per query vertex (§VI).
  *
  * `bits(v)` is the OR over all sites of the hashed internal-candidate sets
  * of variable vertex `v`; a binding `c` for `v` is viable only if its bit
  * is set. Vertices absent from the map are unfiltered (constants, or the
  * optimization disabled).
  */
final case class CandidateBits(len: Int, bits: Map[Int, Array[Long]]) extends Serializable {

  def pass(vertex: Int, c: Long): Boolean =
    bits.get(vertex) match {
      case None     => true
      case Some(ws) =>
        val b = CandidateBits.bitOf(c, len)
        (ws(b >> 6) & (1L << (b & 63))) != 0
    }
}

object CandidateBits {
  val empty: CandidateBits = CandidateBits(64, Map.empty)

  /** Deterministic hash of a candidate id into [0, len). */
  def bitOf(c: Long, len: Int): Int = {
    var h = c * 0x9e3779b97f4a7c15L
    h ^= (h >>> 32)
    ((h & Long.MaxValue) % len).toInt
  }

  def wordsFor(len: Int): Int = (len + 63) >> 6

  /** Build one vertex's vector from the set bit positions. */
  def fromBits(len: Int, set: Iterable[Int]): Array[Long] = {
    val ws = new Array[Long](wordsFor(len))
    set.foreach(b => ws(b >> 6) |= (1L << (b & 63)))
    ws
  }
}
