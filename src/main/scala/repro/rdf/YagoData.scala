package repro.rdf

import repro.core.QueryGraph
import scala.util.Random

/** YAGO2-lite: people / movies / cities / countries / prizes under a single
  * URI namespace (`http://yago.org/resource/...`) — which is exactly why
  * semantic-hash partitioning degenerates to plain hashing on YAGO (§VIII-D).
  * Queries YQ1–YQ4 mirror the §VIII shapes: selective complex (YQ1),
  * selective empty (YQ2), unselective heavy (YQ3), moderate (YQ4).
  */
object YagoData {
  val res = "http://yago.org/resource/"
  val voc = "http://yago.org/vocab/"

  val ptype = voc + "type"
  val wasBornIn = voc + "wasBornIn"
  val livesIn = voc + "livesIn"
  val isLocatedIn = voc + "isLocatedIn"
  val actedIn = voc + "actedIn"
  val directed = voc + "directed"
  val isMarriedTo = voc + "isMarriedTo"
  val hasWonPrize = voc + "hasWonPrize"
  val graduatedFrom = voc + "graduatedFrom"

  val Person = voc + "Person"
  val Movie = voc + "Movie"
  val City = voc + "City"
  val Country = voc + "Country"

  final case class Spec(
      nPeople: Int = 500,
      nMovies: Int = 120,
      nCities: Int = 40,
      nCountries: Int = 5,
      nPrizes: Int = 8,
      seed: Long = 11,
  )

  def person(i: Int) = s"${res}person$i"
  def movie(i: Int) = s"${res}movie$i"
  def city(i: Int) = s"${res}city$i"
  def country(i: Int) = s"${res}country$i"
  def prize(i: Int) = s"${res}prize$i"

  def triples(spec: Spec): Vector[(String, String, String)] = {
    import spec._
    val rng = new Random(seed)
    val out = Vector.newBuilder[(String, String, String)]
    def t(s: String, p: String, o: String): Unit = out += ((s, p, o))

    for (c <- 0 until nCountries) t(country(c), ptype, Country)
    for (c <- 0 until nCities) {
      t(city(c), ptype, City)
      t(city(c), isLocatedIn, country(c % nCountries))
    }
    for (m <- 0 until nMovies) t(movie(m), ptype, Movie)

    for (p <- 0 until nPeople) {
      val pe = person(p)
      t(pe, ptype, Person)
      t(pe, wasBornIn, city(rng.nextInt(nCities)))
      if (rng.nextDouble() < 0.8) t(pe, livesIn, city(rng.nextInt(nCities)))
      // 30% act, 8% direct; 5% act in a movie they also directed (YQ4)
      if (rng.nextDouble() < 0.30) t(pe, actedIn, movie(rng.nextInt(nMovies)))
      if (rng.nextDouble() < 0.08) {
        val m = movie(rng.nextInt(nMovies))
        t(pe, directed, m)
        if (rng.nextDouble() < 0.6) t(pe, actedIn, m)
      }
      // prizes only for idx % 3 == 0; marriages pair (3i+1, 3i+2): a married
      // person never holds a prize, making YQ2 provably empty
      if (p % 3 == 0 && rng.nextDouble() < 0.5) t(pe, hasWonPrize, prize(rng.nextInt(nPrizes)))
      if (p % 3 == 1 && p + 1 < nPeople) t(pe, isMarriedTo, person(p + 1))
      if (rng.nextDouble() < 0.3) t(pe, graduatedFrom, s"${res}university${rng.nextInt(10)}")
    }
    // deterministic seed cluster so YQ1 is small but never empty:
    // person0 directed movie0, was born in city0, and has two co-actors
    t(person(0), directed, movie(0))
    t(person(0), wasBornIn, city(0))
    t(person(1), actedIn, movie(0))
    t(person(2), actedIn, movie(0))
    out.result().distinct
  }

  def graph(spec: Spec = Spec()): RdfGraph = RdfGraph.fromStrings(triples(spec))

  /** gStore-signature predicates (types only — YAGO has no literal attrs here). */
  val attributePredicates: Set[String] = Set(ptype)

  def queries: Vector[(String, QueryGraph, Boolean)] = Vector(
    // complex, selective constant: directors born in city0 and their casts
    ("YQ1", QueryGraph.of(
      s"?d $directed ?m",
      s"?a $actedIn ?m",
      s"?d $wasBornIn ${city(0)}"), true),
    // complex, selective, provably empty: married prize-winners
    ("YQ2", QueryGraph.of(
      s"?p $hasWonPrize ${prize(0)}",
      s"?p $isMarriedTo ?q",
      s"?q $hasWonPrize ${prize(1)}"), true),
    // complex, unselective, heavy: pairs of people tied to the same country
    ("YQ3", QueryGraph.of(
      s"?a $wasBornIn ?c1",
      s"?c1 $isLocatedIn ?co",
      s"?b $livesIn ?c2",
      s"?c2 $isLocatedIn ?co"), false),
    // complex, moderate: actor-directors, their birth cities and countries
    ("YQ4", QueryGraph.of(
      s"?a $actedIn ?m",
      s"?a $directed ?m",
      s"?a $wasBornIn ?c",
      s"?c $isLocatedIn ?co"), true),
  )
}
