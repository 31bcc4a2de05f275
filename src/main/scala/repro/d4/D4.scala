package repro.d4

import org.apache.spark.graphx.{Edge, Graph, VertexId}
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.LakeGraph
import repro.lake.DataLake

/** Baseline: unsupervised domain discovery in the spirit of D4 (Ota,
  * Mueller, Freire, Srivastava — "Data-driven domain discovery for
  * structured datasets", VLDB 2020), as used by the paper (§5) to detect
  * homographs: discover domains, then flag any value assigned to more than
  * one domain.
  *
  * This is a behaviour-level re-implementation, not a port (DESIGN.md
  * substitution 5). It preserves the two failure modes the paper attributes
  * to D4:
  *
  *   1. *Partial coverage* — domains are clusters of at least
  *      `minDomainCols` columns whose value sets overlap strongly
  *      (Jaccard >= `tau`); a column without a sufficiently similar peer is
  *      assigned no domain, so homographs occurring there are invisible
  *      (the paper: D4 mapped domains onto only 14 of SB's 39 columns).
  *   2. *Dominant-meaning absorption* — a value supported much more
  *      strongly by one domain is assigned only to that domain
  *      (support < `dominance` x the max support is pruned), so unbalanced
  *      homographs are missed (the paper: "D4 at times placing homographs
  *      into a domain represented by their most popular meaning").
  *
  * Pipeline: DataFrame relational stages for cells/overlaps/supports, and
  * GraphX connected components for the column-clustering stage.
  */
object D4 {

  /** @param tau         minimum column-pair Jaccard to link two columns
    * @param dominance   keep a value's domain only if its support is at
    *                    least `dominance` times its best domain's support
    * @param minDomainCols minimum columns for a cluster to count as a domain
    */
  final case class Config(tau: Double = 0.4, dominance: Double = 0.6, minDomainCols: Int = 2)

  /** @param numDomains        number of discovered domains
    * @param columnDomains     DataFrame `(attribute, domainId)`
    * @param valueAssignments  DataFrame `(value, domainId, support)` after
    *                          dominant-meaning pruning
    * @param homographs        values assigned to >= 2 domains
    * @param coveredColumns    number of columns that received a domain
    */
  final case class Result(
      numDomains: Int,
      columnDomains: DataFrame,
      valueAssignments: DataFrame,
      homographs: Set[String],
      coveredColumns: Long) {

    /** Values assigned to more than one domain, with their domain count. */
    def multiDomainValueCount: Long =
      valueAssignments.groupBy("value").agg(countDistinct("domainId").as("nd"))
        .filter(col("nd") >= 2).count()

    /** Average number of domains per assigned value (paper §5.5 reports the
      * analogous per-column statistic for D4).
      */
    def avgDomainsPerValue: Double = {
      val row = valueAssignments.groupBy("value").agg(countDistinct("domainId").as("nd"))
        .agg(avg("nd").as("a")).collect()(0)
      if (row.isNullAt(0)) 0.0 else row.getDouble(0)
    }
  }

  def run(spark: SparkSession, lake: DataLake, config: Config = Config()): Result = {
    import spark.implicits._
    val cells = LakeGraph.normalizedCells(lake).cache()

    // Distinct (value, attribute) with occurrence counts (support weights).
    val occ = cells.groupBy("value", "attribute").agg(count(lit(1)).as("occ")).cache()
    val edges = occ.select("value", "attribute")

    val cards = edges.groupBy("attribute").agg(count(lit(1)).as("card"))

    // Column-pair overlap and Jaccard similarity.
    val e1 = edges.toDF("value", "a1")
    val e2 = edges.toDF("value", "a2")
    val overlaps = e1.join(e2, "value")
      .filter(col("a1") < col("a2"))
      .groupBy("a1", "a2")
      .agg(count(lit(1)).as("overlap"))
    val c1 = cards.toDF("a1", "card1")
    val c2 = cards.toDF("a2", "card2")
    val simPairs = overlaps.join(c1, "a1").join(c2, "a2")
      .withColumn("jaccard",
        col("overlap") / (col("card1") + col("card2") - col("overlap")))
      .filter(col("jaccard") >= config.tau)
      .select("a1", "a2")

    // Column clustering: GraphX connected components over similar pairs.
    val attrIds = edges.select("attribute").distinct().orderBy("attribute")
      .as[String].rdd.zipWithIndex().toDF("attribute", "aid")
    val i1 = attrIds.toDF("a1", "id1")
    val i2 = attrIds.toDF("a2", "id2")
    val pairIds = simPairs.join(i1, "a1").join(i2, "a2")
      .select(col("id1").cast("long"), col("id2").cast("long"))
      .as[(Long, Long)].rdd
      .map { case (x, y) => Edge(x: VertexId, y: VertexId, 1) }
    val vertices = attrIds.select(col("aid").cast("long")).as[Long].rdd.map(id => (id, ()))
    val cc = Graph(vertices, pairIds).connectedComponents().vertices.toDF("aid", "component")

    // Domains: components with >= minDomainCols columns.
    val componentSizes = cc.groupBy("component").agg(count(lit(1)).as("size"))
    val domains = componentSizes.filter(col("size") >= config.minDomainCols).select("component")
    val columnDomains = attrIds.join(cc, "aid").join(domains, "component")
      .select(col("attribute"), col("component").as("domainId"))
      .cache()

    // Value support per domain (total occurrences in the domain's columns),
    // then dominant-meaning pruning.
    val support = occ.join(columnDomains, "attribute")
      .groupBy("value", "domainId")
      .agg(sum("occ").as("support"))
    val maxSupport = support.groupBy("value").agg(max("support").as("maxSupport"))
    val valueAssignments = support.join(maxSupport, "value")
      .filter(col("support") >= lit(config.dominance) * col("maxSupport"))
      .select("value", "domainId", "support")
      .cache()

    val homographs = valueAssignments
      .groupBy("value").agg(countDistinct("domainId").as("nd"))
      .filter(col("nd") >= 2)
      .select("value").as[String].collect().toSet

    val numDomains = domains.count().toInt
    val covered = columnDomains.count()
    cells.unpersist(); occ.unpersist()
    Result(numDomains, columnDomains, valueAssignments, homographs, covered)
  }
}
