package repro.part

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.rdf.RdfGraph

/** One stored triple of a fragment: `frag` hosts it, `sFrag`/`oFrag` are the
  * owner fragments of its endpoints. A crossing edge (`sFrag != oFrag`)
  * appears in both endpoint fragments (Def. 1's replicated `E_i^c`).
  */
final case class FragTriple(frag: Int, s: Long, p: Long, o: Long, sFrag: Int, oFrag: Int) {
  def isCrossing: Boolean = sFrag != oFrag
}

/** A distributed RDF graph (Def. 1): the triple set exploded into per-
  * fragment stores with crossing-edge replicas, as a typed Dataset built
  * with DataFrame joins against the vertex-owner table.
  */
final class DistributedGraph(
    val spark: SparkSession,
    val k: Int,
    val graph: RdfGraph,
    val owners: Map[Long, Int],
    val fragTriples: Dataset[FragTriple],
    val attrPreds: Set[String] = Set.empty,
) extends Serializable {

  import spark.implicits._

  /** |E_i ∪ E_i^c| per fragment (stored edges, incl. replicas). */
  lazy val storedEdgesPerFrag: Map[Int, Long] =
    fragTriples.groupBy($"frag").count().as[(Int, Long)].collect().toMap

  /** Distinct crossing edges of the whole partitioning (E^c, no replicas). */
  lazy val crossingEdges: DataFrame =
    fragTriples.filter($"sFrag" =!= $"oFrag").select($"s", $"p", $"o").distinct()

  lazy val numCrossingEdges: Long = crossingEdges.count()

  /** |E_i^c| per fragment (crossing edges incident to the fragment). */
  lazy val crossingEdgesPerFrag: Map[Int, Long] =
    fragTriples
      .filter($"sFrag" =!= $"oFrag")
      .select($"frag", $"s", $"p", $"o")
      .distinct()
      .groupBy($"frag")
      .count()
      .as[(Int, Long)]
      .collect()
      .toMap
}

object DistributedGraph {

  /** Partition `g` with `partitioner` into `k` fragments and build the
    * fragment stores. The owner table is joined in as a DataFrame (the
    * partitioner output is small: one row per vertex).
    *
    * `attrPreds` are gStore-style attribute predicates (rdf:type, literal
    * attributes): their edges are stored only with the subject and never
    * count as crossing edges — the object is part of the subject's vertex
    * signature, not a partitioned graph vertex.
    */
  def build(
      spark: SparkSession,
      g: RdfGraph,
      partitioner: GraphPartitioner,
      k: Int,
      attrPreds: Set[String] = Set.empty,
  ): DistributedGraph =
    fromOwners(spark, g, partitioner.assign(g, k), k, attrPreds)

  def fromOwners(
      spark: SparkSession,
      g: RdfGraph,
      owners: Map[Long, Int],
      k: Int,
      attrPreds: Set[String] = Set.empty,
  ): DistributedGraph = {
    import spark.implicits._
    require(g.vertexIds.forall(owners.contains), "partitioner must cover every vertex")
    val attrIds = attrPreds.flatMap(g.dict.idOpt).toSeq
    val ownersDf = owners.toSeq.toDF("v", "f")
    var withOwners = g
      .df(spark)
      .join(ownersDf.withColumnRenamed("v", "s").withColumnRenamed("f", "sFrag"), Seq("s"))
      .join(ownersDf.withColumnRenamed("v", "o").withColumnRenamed("f", "oFrag"), Seq("o"))
    if (attrIds.nonEmpty)
      withOwners = withOwners.withColumn(
        "oFrag",
        when($"p".isin(attrIds: _*), $"sFrag").otherwise($"oFrag"),
      )
    // host fragments: owner of s, plus owner of o when the edge crosses
    val frags = withOwners
      .withColumn("frag", explode(array_distinct(array($"sFrag", $"oFrag"))))
      .select($"frag".cast("int"), $"s", $"p", $"o", $"sFrag".cast("int"), $"oFrag".cast("int"))
      .as[FragTriple]
    new DistributedGraph(spark, k, g, owners, frags.cache(), attrPreds)
  }
}
