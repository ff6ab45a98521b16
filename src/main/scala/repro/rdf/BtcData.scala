package repro.rdf

import repro.core.QueryGraph
import scala.util.Random

/** BTC-lite: a heterogeneous, multi-domain web-crawl-style RDF graph
  * (FOAF people, geonames places, documents, cross-domain sameAs links) —
  * the Billion-Triples-Challenge substitute. Queries BQ1–BQ7 mirror
  * Table III: selective stars (BQ1–BQ3), selective complex (BQ4, BQ5),
  * and complex empty queries (BQ6, BQ7).
  */
object BtcData {
  val foaf = "http://xmlns.com/foaf/0.1/"
  val geo = "http://www.geonames.org/ontology#"
  val dc = "http://purl.org/dc/terms/"
  val rdf = "http://www.w3.org/1999/02/22-rdf-syntax-ns#"
  val owl = "http://www.w3.org/2002/07/owl#"

  val ptype = rdf + "type"
  val knows = foaf + "knows"
  val fname = foaf + "name"
  val basedNear = foaf + "based_near"
  val creator = dc + "creator"
  val parentFeature = geo + "parentFeature"
  val sameAs = owl + "sameAs"

  val Person = foaf + "Person"
  val Document = foaf + "Document"
  val Feature = geo + "Feature"

  final case class Spec(
      nPeople: Int = 400,
      nPlaces: Int = 60,
      nCountries: Int = 6,
      nDocs: Int = 300,
      seed: Long = 23,
  )

  def person(i: Int) = s"http://dbpedia.org/resource/person$i"
  def fperson(i: Int) = s"http://example.org/foaf/person$i"
  def place(i: Int) = s"http://sws.geonames.org/place$i"
  def countryE(i: Int) = s"http://sws.geonames.org/country$i"
  def doc(i: Int) = s"http://example.org/doc/doc$i"
  def nameLit(i: Int) = s"lit://btcname/$i"

  def triples(spec: Spec): Vector[(String, String, String)] = {
    import spec._
    val rng = new Random(seed)
    val out = Vector.newBuilder[(String, String, String)]
    def t(s: String, p: String, o: String): Unit = out += ((s, p, o))

    for (c <- 0 until nCountries) t(countryE(c), ptype, Feature)
    for (pl <- 0 until nPlaces) {
      t(place(pl), ptype, Feature)
      t(place(pl), parentFeature, countryE(pl % nCountries))
    }
    for (p <- 0 until nPeople) {
      t(person(p), ptype, Person)
      t(person(p), fname, nameLit(p))
      if (rng.nextDouble() < 0.7) t(person(p), basedNear, place(rng.nextInt(nPlaces)))
      // knows is strictly ascending: no reciprocal pairs, so BQ6 is empty
      for (_ <- 0 until rng.nextInt(3)) {
        val q = p + 1 + rng.nextInt(math.max(1, nPeople - p - 1))
        if (q < nPeople) t(person(p), knows, person(q))
      }
      // cross-domain alias for some people
      if (p % 5 == 0) t(person(p), sameAs, fperson(p))
    }
    for (d <- 0 until nDocs) {
      t(doc(d), ptype, Document)
      t(doc(d), creator, person(d % (nPeople / 2))) // first half author docs
    }
    // deterministic neighbourhoods so BQ4/BQ5 have fixed small results:
    // person7 knows persons 8..11, all based near place(3) (-> country3);
    // person12 is based near place(1) (-> country1)
    for (j <- 8 to 11; if j < nPeople) {
      t(person(7), knows, person(j))
      t(person(j), basedNear, place(3))
    }
    if (nPeople > 12) t(person(12), basedNear, place(1))
    out.result().distinct
  }

  def graph(spec: Spec = Spec()): RdfGraph = RdfGraph.fromStrings(triples(spec))

  /** gStore-signature predicates: rdf:type and the unique foaf:name literal. */
  val attributePredicates: Set[String] = Set(ptype, fname)

  def queries: Vector[(String, QueryGraph, Boolean)] = Vector(
    // selective star: one person by name
    ("BQ1", QueryGraph.of(
      s"?x $fname ${nameLit(42)}",
      s"?x $ptype $Person"), true),
    // selective star: documents of one author
    ("BQ2", QueryGraph.of(
      s"?d $creator ${person(5)}",
      s"?d $ptype $Document"), true),
    // selective star, empty: places have no foaf:name
    ("BQ3", QueryGraph.of(
      s"?x $ptype $Feature",
      s"?x $fname ${nameLit(0)}"), true),
    // selective complex: friends of one person based near country3 places
    ("BQ4", QueryGraph.of(
      s"?p $knows ?q",
      s"?q $basedNear ?pl",
      s"?pl $parentFeature ${countryE(3)}",
      s"?p $fname ${nameLit(7)}"), true),
    // selective complex: docs by authors based near country1 places
    ("BQ5", QueryGraph.of(
      s"?d $creator ?p",
      s"?p $basedNear ?pl",
      s"?pl $parentFeature ${countryE(1)}",
      s"?p $fname ${nameLit(12)}"), true),
    // complex, empty: knows is strictly ascending, so no 3-cycle exists
    ("BQ6", QueryGraph.of(
      s"?p $knows ?q",
      s"?q $knows ?r",
      s"?r $knows ?p"), false),
    // complex, empty: a country is never a Person
    ("BQ7", QueryGraph.of(
      s"?d $creator ?p",
      s"?p $basedNear ?pl",
      s"?pl $parentFeature ?c",
      s"?c $ptype $Person"), false),
  )
}
