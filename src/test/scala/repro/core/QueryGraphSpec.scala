package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.rdf.{Dictionary, LubmData, BtcData}

class QueryGraphSpec extends AnyFunSuite {

  private val dict = Dictionary.build(Seq("u1", "u2", "u3", "p", "q", "lit"))

  test("vertex order is first appearance, s before o") {
    val qg = QueryGraph.of("?a p ?b", "?b q ?c", "?a q lit")
    assert(qg.vertexTerms == Vector(Term.Var("a"), Term.Var("b"), Term.Var("c"), Term.Const("lit")))
    assert(qg.variables == Vector("a", "b", "c"))
  }

  test("edges carry vertex indices") {
    val qg = QueryGraph.of("?a p ?b", "?b q ?a")
    assert(qg.edges == Vector((0, 1, Term.Const("p")), (1, 0, Term.Const("q"))))
  }

  test("star detection: common center") {
    assert(QueryGraph.of("?x p ?a", "?x q ?b", "?x p u1").starCenter.contains(0))
  }

  test("star detection: single pattern is a star") {
    assert(QueryGraph.of("?x p ?y").isStar)
  }

  test("star detection: a 2-edge path is a star (middle vertex covers all edges)") {
    // crossing-edge replication makes any query whose edges all touch one
    // vertex answerable inside that vertex's fragment (§VIII-B)
    assert(QueryGraph.of("?a p ?b", "?b q ?c").isStar)
  }

  test("star detection: a 3-edge path is not a star") {
    assert(!QueryGraph.of("?a p ?b", "?b q ?c", "?c r ?d").isStar)
  }

  test("star detection: paper benchmark shapes") {
    val byName = LubmData.queries.map(t => t._1 -> t._2).toMap
    assert(!byName("LQ1").isStar && !byName("LQ3").isStar && !byName("LQ6").isStar && !byName("LQ7").isStar)
    assert(byName("LQ2").isStar && byName("LQ4").isStar && byName("LQ5").isStar)
    val bq = BtcData.queries.map(t => t._1 -> t._2).toMap
    assert(bq("BQ1").isStar && bq("BQ2").isStar && bq("BQ3").isStar)
    assert(!bq("BQ4").isStar && !bq("BQ6").isStar && !bq("BQ7").isStar)
  }

  test("encode maps constants through the dictionary") {
    val q = QueryGraph.of("?a p u1").encode(dict).get
    assert(q.n == 2)
    assert(q.vertices(0).isVar && !q.vertices(1).isVar)
    assert(q.vertices(1).constId == dict.id("u1"))
    assert(q.edges.head.predId == dict.id("p"))
  }

  test("encode returns None when a vertex constant is missing") {
    assert(QueryGraph.of("?a p missing").encode(dict).isEmpty)
  }

  test("encode returns None when a predicate constant is missing") {
    assert(QueryGraph.of("?a nosuchpred ?b").encode(dict).isEmpty)
  }

  test("variable predicates encode as -1") {
    val q = QueryGraph.of("?a ?pp ?b").encode(dict).get
    assert(q.edges.head.predId == -1L)
  }

  test("connectedMasks of a path query") {
    val q = QueryGraph.of("?a p ?b", "?b p ?c").encode(dict).get
    // vertices a=0,b=1,c=2; connected subsets: {a},{b},{c},{ab},{bc},{abc}
    assert(q.connectedMasks.toSet == Set(1L, 2L, 4L, 3L, 6L, 7L))
  }

  test("isConnected / neighborhood") {
    val q = QueryGraph.of("?a p ?b", "?b p ?c").encode(dict).get
    assert(!q.isConnected(5L)) // {a, c}
    assert(q.neighborhood(2L) == 5L) // N({b}) = {a, c}
    assert(q.neighborhood(1L) == 2L) // N({a}) = {b}
  }

  test("fullMask covers all vertices") {
    val q = QueryGraph.of("?a p ?b", "?b p ?c").encode(dict).get
    assert(q.fullMask == 7L)
  }

  test("BgpSql compiles constants, joins and DISTINCT") {
    val qg = QueryGraph.of("?a p ?b", "?b q u2")
    val sql = BgpSql.sql(qg, dict).get
    assert(sql.startsWith("SELECT DISTINCT"))
    assert(sql.contains(s"t0.p = ${dict.id("p")}"))
    assert(sql.contains(s"t1.o = ${dict.id("u2")}"))
    assert(sql.contains("t1.s = t0.o")) // shared variable b
    assert(sql.contains("AS a") && sql.contains("AS b"))
  }

  test("BgpSql returns None on missing constants") {
    assert(BgpSql.sql(QueryGraph.of("?a p gone"), dict).isEmpty)
  }

  test("QueryGraph.of rejects malformed patterns") {
    intercept[IllegalArgumentException](QueryGraph.of("?a p"))
  }

  test("query graphs reject more than 62 vertices") {
    val pats = (0 until 64).map(i => TriplePattern(Term.Var(s"v$i"), Term.Const("p"), Term.Var(s"v${i + 1}")))
    val qg = QueryGraph(pats.toVector)
    val bigDict = Dictionary.build(Seq("p"))
    intercept[IllegalArgumentException](qg.encode(bigDict))
  }
}
