package repro.core

import repro.{Oracle, SparkSpec}
import repro.bench.Workloads
import repro.part.{DistributedGraph, Partitioners}

/** End-to-end: gStoreD (all opt levels, all partitioners) vs the DuckDB
  * oracle on every benchmark query of the three workloads.
  */
class GStoreDSpec extends SparkSpec {

  private lazy val workloads = Seq(
    Workloads.lubm("test"),
    Workloads.yago("test"),
    Workloads.btc("test"),
  )
  private val k = 4

  private lazy val dgs = workloads.map { wl =>
    wl.name -> DistributedGraph.build(spark, wl.graph, Partitioners.Hash, k)
  }.toMap

  // attribute-folded deployments (the bench configuration: gStore treats
  // types/literal attributes as vertex signatures)
  private lazy val dgsFolded = workloads.map { wl =>
    wl.name -> DistributedGraph.build(spark, wl.graph, Partitioners.Hash, k, wl.attrPreds)
  }.toMap

  // --- oracle equivalence for every benchmark query ------------------------
  for (wl <- Seq("lubm", "yago", "btc")) {
    lazy val w = workloads.find(_.name.toLowerCase.startsWith(wl.take(3))).get
    for ((name, q, _) <- Workloads.byName(wl, "test").queries) {
      test(s"$name matches the DuckDB oracle") {
        val dg = dgs(w.name)
        val res = GStoreD.evaluate(dg, q)
        BgpSql.sql(q, w.graph.dict) match {
          case Some(sql) =>
            Oracle.assertEquivalent(res.matches, sql, "triples" -> w.graph.df(spark))
          case None =>
            assert(res.matches.count() == 0)
        }
      }

      test(s"$name matches the DuckDB oracle with attribute folding") {
        val res = GStoreD.evaluate(dgsFolded(w.name), q)
        BgpSql.sql(q, w.graph.dict) match {
          case Some(sql) =>
            Oracle.assertEquivalent(res.matches, sql, "triples" -> w.graph.df(spark))
          case None =>
            assert(res.matches.count() == 0)
        }
      }
    }
  }

  // --- star fast path -------------------------------------------------------
  for ((wlName, qName) <- Seq(("lubm", "LQ2"), ("lubm", "LQ4"), ("lubm", "LQ5"),
      ("btc", "BQ1"), ("btc", "BQ2"), ("btc", "BQ3"))) {
    test(s"$qName runs on the star fast path with zero communication") {
      val w = Workloads.byName(wlName, "test")
      val (_, q, _) = w.queries.find(_._1 == qName).get
      val res = GStoreD.evaluate(dgs(w.name), q)
      val s = res.stats
      assert(s.starFastPath)
      assert(s.numCrossingMatches == 0 && s.numLpms == 0)
      assert(s.candShipmentBytes == 0 && s.lecShipmentBytes == 0)
    }
  }

  // --- opt levels agree ------------------------------------------------------
  for ((name, q, _) <- Workloads.lubm("test").queries if !q.isStar) {
    test(s"$name: Basic, LA, LO and Full agree") {
      val dg = dgs("LUBM")
      val results = OptLevel.all.map { lvl =>
        val r = GStoreD.evaluate(dg, q, lvl)
        lvl.name -> r.matches.collect().map(_.toSeq).toSet
      }
      assert(results.map(_._2).distinct.size == 1, results.map { case (n, s) => n -> s.size })
    }
  }

  for ((name, q, _) <- Workloads.yago("test").queries if !q.isStar) {
    test(s"$name: LA and Full agree") {
      val dg = dgs("YAGO2")
      val a = GStoreD.evaluate(dg, q, OptLevel.LA).matches.collect().map(_.toSeq).toSet
      val b = GStoreD.evaluate(dg, q, OptLevel.Full).matches.collect().map(_.toSeq).toSet
      assert(a == b)
    }
  }

  // --- partitioning tolerance ------------------------------------------------
  for (p <- Partitioners.all) {
    test(s"LQ1 result is identical under ${p.name} partitioning") {
      val w = workloads.head
      val dg = DistributedGraph.build(spark, w.graph, p, k)
      val (_, q, _) = w.queries.find(_._1 == "LQ1").get
      val got = GStoreD.evaluate(dg, q).matches.collect().map(_.toSeq).toSet
      val want = GStoreD.evaluate(dgs("LUBM"), q).matches.collect().map(_.toSeq).toSet
      dg.fragTriples.unpersist()
      assert(got == want)
    }
  }

  test("single-fragment deployment answers everything locally") {
    val w = workloads.head
    val dg = DistributedGraph.build(spark, w.graph, Partitioners.Hash, 1)
    val (_, q, _) = w.queries.find(_._1 == "LQ1").get
    val res = GStoreD.evaluate(dg, q)
    assert(res.stats.numCrossingMatches == 0)
    val want = GStoreD.evaluate(dgs("LUBM"), q).matches.collect().map(_.toSeq).toSet
    assert(res.matches.collect().map(_.toSeq).toSet == want)
    dg.fragTriples.unpersist()
  }

  test("a query with an unknown constant returns an empty, well-typed frame") {
    val q = QueryGraph.of(s"?x ${repro.rdf.LubmData.memberOf} http://nowhere.example/dept")
    val res = GStoreD.evaluate(dgs("LUBM"), q)
    assert(res.matches.columns.toSeq == Seq("x"))
    assert(res.matches.count() == 0)
  }

  test("LQ3 is empty but exercises the full pipeline") {
    val w = workloads.head
    val (_, q, _) = w.queries.find(_._1 == "LQ3").get
    val res = GStoreD.evaluate(dgs("LUBM"), q)
    assert(res.stats.numMatches == 0)
    assert(!res.stats.starFastPath)
  }

  test("selective LQ6 produces crossing matches under hash partitioning") {
    val w = workloads.head
    val (_, q, _) = w.queries.find(_._1 == "LQ6").get
    val res = GStoreD.evaluate(dgs("LUBM"), q)
    assert(res.stats.numMatches > 0)
    assert(res.stats.numCrossingMatches > 0) // hash scatters the path
  }

  test("stats are internally consistent") {
    val w = workloads.head
    val (_, q, _) = w.queries.find(_._1 == "LQ1").get
    val s = GStoreD.evaluate(dgs("LUBM"), q).stats
    assert(s.totalTimeMs == s.partialEvalTimeMs + s.assemblyTimeMs)
    assert(s.numLpmsKept <= s.numLpms)
    assert(s.numCrossingMatches <= s.numMatches)
    assert(s.lecShipmentBytes > 0 && s.candShipmentBytes > 0)
  }

  test("LO prunes LPMs before assembly on LQ1") {
    val w = workloads.head
    val (_, q, _) = w.queries.find(_._1 == "LQ1").get
    val s = GStoreD.evaluate(dgs("LUBM"), q, OptLevel.LO).stats
    assert(s.numLpmsKept < s.numLpms)
  }
}
