package repro.core

import repro.SparkSpec
import repro.bench.Workloads
import repro.part.{DistributedGraph, Partitioners}
import repro.rdf.RdfGraph

class CandidateExchangeSpec extends SparkSpec {

  // a --p--> b --q--> c ; d --p--> b (b is the only ?y candidate)
  private lazy val g = RdfGraph.fromStrings(Seq(
    ("a", "p", "b"), ("b", "q", "c"), ("d", "p", "b"), ("e", "q", "c")))
  private lazy val owners = Map(
    g.dict.id("a") -> 0, g.dict.id("b") -> 1, g.dict.id("c") -> 0,
    g.dict.id("d") -> 1, g.dict.id("e") -> 1)
  private lazy val dg = DistributedGraph.fromOwners(spark, g, owners, 2)
  private lazy val q = QueryGraph.of("?x p ?y", "?y q ?z").encode(g.dict).get

  test("internal candidates require every incident pattern to match") {
    val res = CandidateExchange.run(dg, q, len = 256)
    // ?y needs an incoming p and an outgoing q: only b qualifies (site 1)
    assert(res.bits.pass(1, g.dict.id("b")))
    // e has q but no incoming p: not a candidate anywhere (modulo hashing,
    // which cannot collide here with only one bit set)
    val set = Seq("a", "b", "c", "d", "e").map(g.dict.id).filter(res.bits.pass(1, _))
    assert(set == Seq(g.dict.id("b")))
  }

  test("per-variable vectors are independent") {
    val res = CandidateExchange.run(dg, q, len = 256)
    assert(res.bits.pass(0, g.dict.id("a"))) // ?x: a has outgoing p
    assert(res.bits.pass(0, g.dict.id("d")))
    assert(!res.bits.pass(0, g.dict.id("c")))
    assert(res.bits.pass(2, g.dict.id("c"))) // ?z: c has incoming q
  }

  test("constants get no vector (unfiltered)") {
    val qc = QueryGraph.of("?x p b").encode(g.dict).get
    val res = CandidateExchange.run(dg, qc, len = 256)
    assert(!res.bits.bits.contains(1))
    assert(res.bits.pass(1, 12345L))
  }

  test("shipment is positive and bounded by the dense-vector total") {
    val res = CandidateExchange.run(dg, q, len = 256)
    assert(res.shipmentBytes > 0)
    // upload <= k * nVars * len/8, download == k * nVars * len/8
    assert(res.shipmentBytes <= 2L * dg.k * 3 * (256 / 8))
  }

  test("bit vectors never exclude bindings that appear in real matches") {
    val res = CandidateExchange.run(dg, q, len = 64)
    val want = BruteForce.centralMatches(g.triples, q)
    want.foreach { m =>
      (0 until q.n).foreach(i => assert(res.bits.pass(i, m(i))))
    }
  }

  test("Full equals LO on LUBM despite the extra filtering") {
    val wl = Workloads.lubm("test")
    val dgl = DistributedGraph.build(spark, wl.graph, Partitioners.Hash, 4)
    val (_, lq6, _) = wl.queries.find(_._1 == "LQ6").get
    val a = GStoreD.evaluate(dgl, lq6, OptLevel.LO).matches.collect().map(_.toSeq).toSet
    val b = GStoreD.evaluate(dgl, lq6, OptLevel.Full).matches.collect().map(_.toSeq).toSet
    dgl.fragTriples.unpersist()
    assert(a == b)
  }

  test("Full never generates more LPMs than LO") {
    val wl = Workloads.lubm("test")
    val dgl = DistributedGraph.build(spark, wl.graph, Partitioners.Hash, 4)
    val (_, lq3, _) = wl.queries.find(_._1 == "LQ3").get
    val lo = GStoreD.evaluate(dgl, lq3, OptLevel.LO).stats
    val full = GStoreD.evaluate(dgl, lq3, OptLevel.Full).stats
    dgl.fragTriples.unpersist()
    assert(full.numLpms <= lo.numLpms)
  }
}
