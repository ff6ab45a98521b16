package repro.part

import org.scalatest.funsuite.AnyFunSuite
import repro.rdf.{LubmData, RdfGraph, YagoData}

class PartitionerSpec extends AnyFunSuite {

  private val lubm = LubmData.graph(LubmData.Spec(nUniv = 6))
  private val yago = YagoData.graph(YagoData.Spec(nPeople = 200, nMovies = 40))
  private val k = 4

  private def crossingCount(g: RdfGraph, owners: Map[Long, Int]): Int =
    g.triples.count { case (s, _, o) => owners(s) != owners(o) }

  for (p <- Partitioners.all) {
    test(s"${p.name}: covers every vertex within [0, k)") {
      val owners = p.assign(lubm, k)
      assert(lubm.vertexIds.forall(owners.contains))
      assert(owners.values.forall(f => f >= 0 && f < k))
    }

    test(s"${p.name}: deterministic") {
      assert(p.assign(lubm, k) == p.assign(lubm, k))
    }

    test(s"${p.name}: uses more than one fragment") {
      assert(p.assign(lubm, k).values.toSet.size > 1)
    }
  }

  test("hash partitioning spreads vertices roughly evenly") {
    val owners = Partitioners.Hash.assign(lubm, k)
    val sizes = owners.values.groupBy(identity).view.mapValues(_.size).values.toVector
    val avg = lubm.vertexIds.size.toDouble / k
    assert(sizes.forall(s => s > avg * 0.5 && s < avg * 1.5))
  }

  test("semantic hash keeps a university's entities together on LUBM") {
    val owners = Partitioners.SemanticHash.assign(lubm, k)
    val univ3 = lubm.vertexIds.filter(v => lubm.dict.str(v).startsWith("http://univ3.edu/"))
    assert(univ3.nonEmpty)
    assert(univ3.map(owners).toSet.size == 1)
  }

  test("semantic hash yields fewer crossing edges than hash on LUBM") {
    val ch = crossingCount(lubm, Partitioners.Hash.assign(lubm, k))
    val cs = crossingCount(lubm, Partitioners.SemanticHash.assign(lubm, k))
    assert(cs < ch)
  }

  test("semantic hash degenerates to scattering on single-namespace YAGO") {
    // all YAGO entities share one URI hierarchy => the oversized prefix
    // group is split by full-URI hash, touching every fragment
    val owners = Partitioners.SemanticHash.assign(yago, k)
    assert(owners.values.toSet.size == k)
    val ch = crossingCount(yago, Partitioners.Hash.assign(yago, k))
    val cs = crossingCount(yago, owners)
    assert(math.abs(cs - ch).toDouble / math.max(ch, 1) < 0.5)
  }

  test("semantic prefix extraction uses the URI authority") {
    assert(Partitioners.SemanticHash.prefix("http://univ3.edu/dept1/prof2") == "univ3.edu")
    assert(Partitioners.SemanticHash.prefix("http://yago.org/resource/person7") == "yago.org")
    assert(Partitioners.SemanticHash.prefix("lit://name/x") == "name")
  }

  test("metis-like produces fewer crossing edges than hash on LUBM") {
    val ch = crossingCount(lubm, Partitioners.Hash.assign(lubm, k))
    val cm = crossingCount(lubm, Partitioners.MetisLike.assign(lubm, k))
    assert(cm < ch)
  }

  test("metis-like balances vertex counts approximately") {
    val owners = Partitioners.MetisLike.assign(lubm, k)
    val sizes = (0 until k).map(f => owners.values.count(_ == f))
    assert(sizes.forall(_ > 0))
    assert(sizes.max <= 2 * (lubm.vertexIds.size / k + 1))
  }
}
