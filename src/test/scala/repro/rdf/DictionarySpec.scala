package repro.rdf

import org.scalatest.funsuite.AnyFunSuite

class DictionarySpec extends AnyFunSuite {

  test("ids are dense, zero-based, and sorted by term") {
    val d = Dictionary.build(Seq("b", "a", "c", "a"))
    assert(d.size == 3)
    assert(d.id("a") == 0 && d.id("b") == 1 && d.id("c") == 2)
  }

  test("str is the inverse of id") {
    val d = Dictionary.build(Seq("x", "y", "z"))
    (0L to 2L).foreach(i => assert(d.id(d.str(i)) == i))
  }

  test("deterministic across input orderings") {
    val d1 = Dictionary.build(Seq("p", "q", "r"))
    val d2 = Dictionary.build(Seq("r", "p", "q", "p"))
    assert(d1.idOf == d2.idOf)
  }

  test("idOpt returns None for unknown terms") {
    val d = Dictionary.build(Seq("a"))
    assert(d.idOpt("zzz").isEmpty && d.idOpt("a").contains(0L))
  }

  test("id throws for unknown terms") {
    val d = Dictionary.build(Seq("a"))
    intercept[NoSuchElementException](d.id("nope"))
  }

  test("ofTriples covers subjects, predicates and objects") {
    val d = Dictionary.ofTriples(Seq(("s1", "p1", "o1"), ("s2", "p1", "s1")))
    assert(Seq("s1", "p1", "o1", "s2").forall(d.idOpt(_).isDefined))
    assert(d.size == 4)
  }

  test("RdfGraph.fromStrings encodes and deduplicates") {
    val g = RdfGraph.fromStrings(Seq(("a", "p", "b"), ("a", "p", "b"), ("b", "p", "c")))
    assert(g.numTriples == 2)
    assert(g.vertexIds.size == 3) // a, b, c (p is an edge label only)
    assert(g.predicateIds.size == 1)
  }

  test("undirected adjacency is symmetric") {
    val g = RdfGraph.fromStrings(Seq(("a", "p", "b"), ("b", "p", "c")))
    val a = g.dict.id("a"); val b = g.dict.id("b"); val c = g.dict.id("c")
    assert(g.undirectedAdj(a).contains(b) && g.undirectedAdj(b).contains(a))
    assert(g.undirectedAdj(b).toSet == Set(a, c))
  }
}
