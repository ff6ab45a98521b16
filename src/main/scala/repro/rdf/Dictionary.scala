package repro.rdf

/** Bidirectional URI/literal <-> Long id encoding.
  *
  * Ids are assigned by sorting the distinct term strings, so a dictionary is
  * deterministic in its input set — tests and the DuckDB oracle see stable
  * ids across runs. Subjects, predicates and objects share one id space
  * (RDF vocabulary terms may appear in several positions).
  */
final class Dictionary private (
    val idOf: Map[String, Long],
    val strOf: Map[Long, String],
) extends Serializable {

  /** Number of distinct terms. */
  def size: Int = idOf.size

  /** Id for a term that must exist (generator-produced terms). */
  def id(term: String): Long =
    idOf.getOrElse(term, throw new NoSuchElementException(s"term not in dictionary: $term"))

  /** Id for a term that may be absent (query constants). */
  def idOpt(term: String): Option[Long] = idOf.get(term)

  /** Term string for an id that must exist. */
  def str(id: Long): String =
    strOf.getOrElse(id, throw new NoSuchElementException(s"id not in dictionary: $id"))
}

object Dictionary {

  /** Build a dictionary over the distinct strings of `terms` (sorted order). */
  def build(terms: IterableOnce[String]): Dictionary = {
    val sorted = terms.iterator.toSet.toVector.sorted
    val idOf = sorted.iterator.zipWithIndex.map { case (s, i) => s -> i.toLong }.toMap
    new Dictionary(idOf, idOf.map(_.swap))
  }

  /** Build from raw string triples (covers all three positions). */
  def ofTriples(triples: Iterable[(String, String, String)]): Dictionary =
    build(triples.iterator.flatMap { case (s, p, o) => Iterator(s, p, o) })
}
