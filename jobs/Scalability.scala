package repro.jobs

import repro.core.{Betweenness, BipartiteGraph, LakeGraph}
import repro.data.TusGen

/** Paper §5.4 (Figures 8-9): approximate-BC runtime vs graph size on
  * NYC-EDU-scale analogues.
  *
  * Usage: spark-submit ... repro.jobs.Scalability [maxColumns]
  */
object Scalability {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("scalability")
    val maxCols = Jobs.arg(args, 0, 3200L).toInt
    println("columns | values | edges | build(s) | bc(s)")
    Iterator.iterate(maxCols / 4)(_ * 2).takeWhile(_ <= maxCols).foreach { nCols =>
      val spec = TusGen.generate(TusGen.Params(
        nDomains = 250, nColumns = nCols, maxVocab = 9000, domainSkew = 0.4, seed = 1))
      val lake = spec.toLake(spark)
      val t0 = System.nanoTime()
      val graph = LakeGraph.build(lake)
      val csr = BipartiteGraph.toCsr(graph)
      val build = (System.nanoTime() - t0) / 1e9
      val t1 = System.nanoTime()
      Betweenness.approximate(spark, csr, math.max(100, csr.numNodes / 100), seed = 7)
      val bc = (System.nanoTime() - t1) / 1e9
      println(f"$nCols%7d | ${csr.numValues}%6d | ${csr.numEdges}%7d | $build%7.1f | $bc%5.1f")
    }
    spark.stop()
  }
}
