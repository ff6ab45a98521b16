package repro.bench

import repro.core.QueryGraph
import repro.rdf.{BtcData, LubmData, RdfGraph, YagoData}

/** Named datasets + benchmark queries at two size tiers: `test` (unit
  * tests, ~5–15k triples) and `bench` (tables, ~40–80k triples).
  */
object Workloads {

  final case class Workload(
      name: String,
      graph: RdfGraph,
      queries: Vector[(String, QueryGraph, Boolean)],
      attrPreds: Set[String],
  )

  def lubm(tier: String = "bench"): Workload = {
    val spec = tier match {
      case "test" => LubmData.Spec(nUniv = 8)
      case _      => LubmData.Spec(nUniv = 60, gradsPerDept = 12, undergradsPerDept = 25)
    }
    Workload("LUBM", LubmData.graph(spec), LubmData.queries, LubmData.attributePredicates)
  }

  def yago(tier: String = "bench"): Workload = {
    val spec = tier match {
      case "test" => YagoData.Spec(nPeople = 250, nMovies = 60)
      case _      => YagoData.Spec(nPeople = 800, nMovies = 200, nCities = 60, nCountries = 6)
    }
    Workload("YAGO2", YagoData.graph(spec), YagoData.queries, YagoData.attributePredicates)
  }

  def btc(tier: String = "bench"): Workload = {
    val spec = tier match {
      case "test" => BtcData.Spec(nPeople = 200, nDocs = 150)
      case _      => BtcData.Spec(nPeople = 1200, nPlaces = 80, nDocs = 900)
    }
    Workload("BTC", BtcData.graph(spec), BtcData.queries, BtcData.attributePredicates)
  }

  def byName(name: String, tier: String): Workload = name.toLowerCase match {
    case "lubm" => lubm(tier)
    case "yago" | "yago2" => yago(tier)
    case "btc"  => btc(tier)
    case other  => throw new IllegalArgumentException(s"unknown workload: $other")
  }
}
