package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.lake.DataLake

/** End-to-end DomainNet pipeline (paper §3.4):
  *
  *   1. construct the bipartite graph from the lake ([[LakeGraph]]);
  *   2. compute a centrality measure per value node ([[Betweenness]] /
  *      [[Lcc]]);
  *   3. rank value nodes (descending BC, ascending LCC) — the top of the
  *      ranking are the homograph candidates shown to the user.
  */
object DomainNet {

  /** Which centrality measure scores the value nodes. */
  sealed trait Measure
  /** Exact betweenness centrality. */
  case object ExactBC extends Measure
  /** Sampled betweenness centrality (`numSamples` BFS sources). */
  final case class ApproxBC(numSamples: Int, seed: Long = 7L) extends Measure
  /** Bipartite local clustering coefficient. */
  case object LCC extends Measure

  /** A scored lake: graph + per-value scores joined back to value strings.
    *
    * @param scores DataFrame `(value, valueId, score, rank)` where rank 1
    *               is the strongest homograph candidate
    */
  final case class Result(graph: LakeGraph, csr: Csr, scores: DataFrame) {

    /** Top-k candidate value strings, strongest first. */
    def topK(k: Int): Seq[String] = {
      import scores.sparkSession.implicits._
      scores.orderBy("rank").limit(k).select("value").as[String].collect().toSeq
    }
  }

  /** Build the graph and score every value node with `measure`. */
  def run(spark: SparkSession, lake: DataLake, measure: Measure): Result = {
    val graph = LakeGraph.build(lake)
    val csr = BipartiteGraph.toCsr(graph)
    score(spark, graph, csr, measure)
  }

  /** Score a pre-built graph (lets callers reuse one graph for several
    * measures, as the benches do).
    */
  def score(spark: SparkSession, graph: LakeGraph, csr: Csr, measure: Measure): Result = {
    val nv = csr.numValues
    val (rawScores, ascending) = measure match {
      case ExactBC            => (Betweenness.exact(spark, csr, normalized = true), false)
      case ApproxBC(s, seed)  => (Betweenness.approximate(spark, csr, s, seed, normalized = true), false)
      case LCC                => (Lcc.compute(spark, csr), true)
    }
    // BC sums per-source dependencies with a tree reduction whose combine
    // order follows task completion; round away the resulting float noise
    // (all scores here are normalized to [0, 1]) so that genuinely tied
    // nodes always fall back to the valueId tie-break deterministically.
    val raw = rawScores.map(s => math.rint(s * 1e9) / 1e9)
    import spark.implicits._
    val valueScores = (0 until nv).map(i => (i.toLong, raw(i))).toDF("valueId", "score")
    val ordered =
      if (ascending) valueScores.orderBy(col("score").asc, col("valueId").asc)
      else valueScores.orderBy(col("score").desc, col("valueId").asc)
    // Deterministic dense ranking via zipWithIndex (no single-partition window).
    val ranked = ordered
      .as[(Long, Double)]
      .rdd
      .zipWithIndex()
      .map { case ((id, s), r) => (id, s, r + 1) }
      .toDF("valueId", "score", "rank")
    Result(graph, csr, ranked.join(graph.values, "valueId").select("value", "valueId", "score", "rank"))
  }
}
