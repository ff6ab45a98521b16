package repro.core

import repro.rdf.Dictionary

/** A SPARQL term: either a constant (URI/literal) or a variable. */
sealed trait Term extends Serializable
object Term {
  final case class Const(value: String) extends Term
  final case class Var(name: String) extends Term

  /** `"?x"` becomes a variable, anything else a constant — tiny BGP sugar. */
  def apply(s: String): Term = if (s.startsWith("?")) Var(s.drop(1)) else Const(s)
}

/** One triple pattern `s p o` of a BGP. */
final case class TriplePattern(s: Term, p: Term, o: Term)

/** A SPARQL BGP as a query graph (Def. 2): subject/object terms are
  * vertices, patterns are labeled edges. Vertex order is order of first
  * appearance (s before o within a pattern) — this fixes the LECSign bit
  * positions and the serialization vector layout.
  */
final case class QueryGraph(patterns: Vector[TriplePattern]) {
  require(patterns.nonEmpty, "empty BGP")

  /** Distinct subject/object terms in first-appearance order. */
  lazy val vertexTerms: Vector[Term] =
    patterns.flatMap(tp => Vector(tp.s, tp.o)).distinct

  /** Names of the (subject/object position) variables, in vertex order. */
  lazy val variables: Vector[String] =
    vertexTerms.collect { case Term.Var(n) => n }

  private def vid(t: Term): Int = vertexTerms.indexOf(t)

  /** Edges as (srcVertexIdx, dstVertexIdx, predicateTerm). */
  lazy val edges: Vector[(Int, Int, Term)] =
    patterns.map(tp => (vid(tp.s), vid(tp.o), tp.p))

  /** A star query has one vertex incident to every pattern (§VIII-B). */
  lazy val starCenter: Option[Int] =
    vertexTerms.indices.find(v => edges.forall { case (s, o, _) => s == v || o == v })

  def isStar: Boolean = starCenter.isDefined

  /** gStore-style attribute folding: patterns `?x <attrPred> <const>` become
    * vertex constraints on `?x` instead of query edges (gStore encodes types
    * and literal attributes in vertex signatures, so they never participate
    * in graph partitioning or crossing edges). Returns the entity-core query
    * plus per-subject-term constraint lists.
    */
  def fold(attrPreds: Set[String]): FoldedQuery = {
    val (attr, rest) = patterns.partition { tp =>
      tp.p match {
        case Term.Const(p) => attrPreds.contains(p) && tp.o.isInstanceOf[Term.Const]
        case _             => false
      }
    }
    val constraints = attr.groupBy(_.s).view.mapValues(_.map { tp =>
      (tp.p.asInstanceOf[Term.Const].value, tp.o.asInstanceOf[Term.Const].value)
    }.toVector).toMap
    FoldedQuery(if (rest.nonEmpty) Some(QueryGraph(rest)) else None, constraints)
  }

  /** Encode against a dictionary. `None` when a constant is absent from the
    * data — the query then provably has no matches.
    */
  def encode(dict: Dictionary): Option[EncodedQuery] = {
    val vOpt = vertexTerms.map {
      case Term.Const(u) => dict.idOpt(u).map(id => QVertex(constId = id, varName = null))
      case Term.Var(n)   => Some(QVertex(constId = -1L, varName = n))
    }
    val pOpt = patterns.map(_.p).map {
      case Term.Const(u) => dict.idOpt(u) // absent predicate constant -> no matches
      case Term.Var(_)   => Some(-1L)
    }
    if (vOpt.exists(_.isEmpty) || pOpt.exists(_.isEmpty)) None
    else {
      val qes = edges.zip(pOpt).zipWithIndex.map { case (((s, o, _), pid), i) =>
        QEdge(i, s, o, pid.get)
      }
      Some(EncodedQuery(vOpt.map(_.get).toIndexedSeq, qes.toIndexedSeq))
    }
  }
}

object QueryGraph {

  /** Build from `"?s pred ?o"`-style whitespace-split rows. Terms containing
    * spaces are not supported (synthetic data has none).
    */
  def of(rows: String*): QueryGraph =
    QueryGraph(rows.toVector.map { r =>
      val parts = r.trim.split("\\s+")
      require(parts.length == 3, s"bad pattern: $r")
      TriplePattern(Term(parts(0)), Term(parts(1)), Term(parts(2)))
    })
}

/** Result of [[QueryGraph.fold]]: the entity-core BGP (None if every
  * pattern folded away) and attribute constraints per subject term.
  */
final case class FoldedQuery(core: Option[QueryGraph], constraints: Map[Term, Vector[(String, String)]])

/** Encoded query vertex: `constId >= 0` for constants, else a variable. */
final case class QVertex(constId: Long, varName: String) {
  def isVar: Boolean = constId < 0
}

/** Encoded query edge; `predId < 0` means a variable predicate. */
final case class QEdge(idx: Int, src: Int, dst: Int, predId: Long)

/** Dictionary-encoded query graph shipped into Spark closures.
  *
  * `constraints(v)` lists `(predId, objId)` attribute edges a binding of
  * vertex `v` must carry; they are verified whenever `v` is bound to an
  * internal vertex (the attribute edges of an internal vertex are always
  * local), and a complete match has every vertex internal somewhere.
  */
final case class EncodedQuery(
    vertices: IndexedSeq[QVertex],
    edges: IndexedSeq[QEdge],
    constraints: Map[Int, Seq[(Long, Long)]] = Map.empty,
) {
  val n: Int = vertices.size
  require(n <= 62, "query too large for Long bitmask signs")
  val fullMask: Long = (1L << n) - 1

  /** Edges incident to vertex v. */
  def incident(v: Int): IndexedSeq[QEdge] = incidentArr(v)

  private lazy val incidentArr: IndexedSeq[IndexedSeq[QEdge]] =
    (0 until n).map(v => edges.filter(e => e.src == v || e.dst == v))

  /** Undirected query-vertex neighbours. */
  lazy val neighbors: IndexedSeq[Set[Int]] =
    (0 until n).map(v => incident(v).iterator.map(e => if (e.src == v) e.dst else e.src).toSet)

  /** Is the vertex-set mask weakly connected in Q? */
  def isConnected(mask: Long): Boolean = {
    if (mask == 0) return false
    val first = java.lang.Long.numberOfTrailingZeros(mask)
    var seen = 1L << first
    var frontier = List(first)
    while (frontier.nonEmpty) {
      val v = frontier.head; frontier = frontier.tail
      neighbors(v).foreach { w =>
        val bit = 1L << w
        if ((mask & bit) != 0 && (seen & bit) == 0) { seen |= bit; frontier ::= w }
      }
    }
    seen == mask
  }

  /** All non-empty weakly-connected vertex subsets (candidate internal cores
    * `I` of Def. 5; see DESIGN.md). n is small, so 2^n enumeration is fine.
    */
  lazy val connectedMasks: Vector[Long] =
    (1L until (1L << n)).filter(isConnected).toVector

  /** Union of query-neighbourhoods of a mask (mask vertices excluded only if
    * not adjacent to others in the mask).
    */
  def neighborhood(mask: Long): Long = {
    var out = 0L
    var v = 0
    while (v < n) {
      if ((mask & (1L << v)) != 0) neighbors(v).foreach(w => out |= 1L << w)
      v += 1
    }
    out
  }
}

/** Compiles a BGP into SQL over a `triples(s, p, o)` table, for the DuckDB
  * oracle and for Spark-SQL reference plans. Selects every subject/object
  * variable (DISTINCT — BGP solutions are sets of mappings).
  */
object BgpSql {

  /** `None` when a constant is not in the dictionary (provably no matches —
    * callers compare against an empty result instead).
    */
  def sql(q: QueryGraph, dict: Dictionary, table: String = "triples"): Option[String] = {
    val aliases = q.patterns.indices.map(i => s"t$i")
    // var name -> first (alias, col) defining it
    var bindings = Map.empty[String, String]
    val preds = scala.collection.mutable.ArrayBuffer.empty[String]
    var missing = false

    def site(term: Term, alias: String, col: String): Unit = term match {
      case Term.Const(u) =>
        dict.idOpt(u) match {
          case Some(id) => preds += s"$alias.$col = $id"
          case None     => missing = true
        }
      case Term.Var(nm) =>
        bindings.get(nm) match {
          case Some(first) => preds += s"$alias.$col = $first"
          case None        => bindings += nm -> s"$alias.$col"
        }
    }

    q.patterns.zipWithIndex.foreach { case (tp, i) =>
      val a = aliases(i)
      site(tp.s, a, "s"); site(tp.p, a, "p"); site(tp.o, a, "o")
    }
    if (missing) return None
    val sel = q.variables.map(v => s"${bindings(v)} AS $v").mkString(", ")
    val from = aliases.map(a => s"$table $a").mkString(", ")
    val where = if (preds.isEmpty) "" else preds.mkString(" WHERE ", " AND ", "")
    Some(s"SELECT DISTINCT $sel FROM $from$where")
  }
}
