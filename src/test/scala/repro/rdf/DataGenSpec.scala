package repro.rdf

import org.scalatest.funsuite.AnyFunSuite

/** Generator invariants the benchmark queries rely on. */
class DataGenSpec extends AnyFunSuite {

  private val lubm = LubmData.triples(LubmData.Spec(nUniv = 4))
  private val yago = YagoData.triples(YagoData.Spec(nPeople = 120, nMovies = 30))
  private val btc = BtcData.triples(BtcData.Spec(nPeople = 80, nDocs = 60))

  test("LUBM generation is deterministic in the seed") {
    assert(lubm == LubmData.triples(LubmData.Spec(nUniv = 4)))
    assert(lubm != LubmData.triples(LubmData.Spec(nUniv = 4, seed = 99)))
  }

  test("YAGO and BTC generation are deterministic") {
    assert(yago == YagoData.triples(YagoData.Spec(nPeople = 120, nMovies = 30)))
    assert(btc == BtcData.triples(BtcData.Spec(nPeople = 80, nDocs = 60)))
  }

  test("LUBM scales with the university count") {
    val small = LubmData.triples(LubmData.Spec(nUniv = 2)).size
    val large = LubmData.triples(LubmData.Spec(nUniv = 8)).size
    assert(large > 3 * small)
  }

  test("LUBM has exactly 2 full professors per department") {
    val full = lubm.filter(t => t._2 == LubmData.ptype && t._3 == LubmData.FullProfessor)
    assert(full.size == 4 * 3 * 2)
    val dept00 = full.count(_._1.startsWith(LubmData.dept(0, 0) + "/"))
    assert(dept00 == 2) // LQ4's expected result size
  }

  test("LUBM has exactly gradsPerDept graduate students per department") {
    val inDept = lubm.filter(t =>
      t._2 == LubmData.memberOf && t._3 == LubmData.dept(1, 1) &&
        lubm.contains((t._1, LubmData.ptype, LubmData.GraduateStudent)))
    assert(inDept.size == 10) // LQ5's expected result size
  }

  test("LUBM professors never have memberOf edges (LQ3 is empty)") {
    val profs = lubm.collect {
      case (s, p, o) if p == LubmData.ptype && o == LubmData.FullProfessor => s
    }.toSet
    assert(!lubm.exists(t => t._2 == LubmData.memberOf && profs(t._1)))
  }

  test("LUBM LQ1 triangle support exists (same-university degrees)") {
    val sameUniv = lubm.count { case (s, p, o) =>
      p == LubmData.undergraduateDegreeFrom && {
        val univIdx = o.stripPrefix("http://univ").takeWhile(_.isDigit)
        s.startsWith(s"http://univ$univIdx.")
      }
    }
    assert(sameUniv > 0)
  }

  test("LUBM URIs use per-university authorities (semantic hash locality)") {
    assert(LubmData.dept(3, 1).startsWith("http://univ3.edu/"))
    assert(lubm.exists(_._1.startsWith("http://univ3.edu/")))
  }

  test("YAGO married people never hold prizes (YQ2 is empty)") {
    val winners = yago.collect { case (s, p, _) if p == YagoData.hasWonPrize => s }.toSet
    val married = yago.flatMap {
      case (s, p, o) if p == YagoData.isMarriedTo => Seq(s, o)
      case _                                      => Nil
    }.toSet
    assert(winners.intersect(married).isEmpty)
    assert(winners.nonEmpty && married.nonEmpty)
  }

  test("YAGO has actor-directors (YQ4 non-empty)") {
    val acted = yago.collect { case (s, p, o) if p == YagoData.actedIn => (s, o) }.toSet
    val directed = yago.collect { case (s, p, o) if p == YagoData.directed => (s, o) }.toSet
    assert(acted.intersect(directed).nonEmpty)
  }

  test("YAGO cities all locate into countries (YQ3 join support)") {
    val located = yago.collect { case (s, p, o) if p == YagoData.isLocatedIn => s }.toSet
    val cities = yago.collect { case (s, p, o) if p == YagoData.ptype && o == YagoData.City => s }.toSet
    assert(cities.subsetOf(located))
  }

  test("BTC knows edges are strictly ascending (BQ6 is empty)") {
    def idx(u: String) = u.reverse.takeWhile(_.isDigit).reverse.toInt
    val knows = btc.collect { case (s, p, o) if p == BtcData.knows => (idx(s), idx(o)) }
    assert(knows.nonEmpty && knows.forall { case (a, b) => a < b })
  }

  test("BTC places have no foaf:name (BQ3 is empty)") {
    val named = btc.collect { case (s, p, _) if p == BtcData.fname => s }.toSet
    assert(!named.exists(_.contains("geonames")))
  }

  test("BTC names are unique per person (BQ1 yields one match)") {
    val n42 = btc.filter(t => t._2 == BtcData.fname && t._3 == BtcData.nameLit(42))
    assert(n42.size == 1)
  }

  test("BTC doc authorship is deterministic (BQ2 yields fixed matches)") {
    val by5 = btc.filter(t => t._2 == BtcData.creator && t._3 == BtcData.person(5))
    assert(by5.nonEmpty)
  }

  test("BTC spans multiple URI domains") {
    val hosts = btc.flatMap(t => Seq(t._1, t._3)).filter(_.startsWith("http://"))
      .map(_.drop(7).takeWhile(_ != '/')).toSet
    assert(hosts.size >= 3)
  }

  test("no duplicate triples reach the graphs") {
    assert(RdfGraph.fromStrings(lubm).numTriples == lubm.distinct.size)
  }
}
