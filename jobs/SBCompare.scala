package repro.jobs

import repro.eval.Experiments

/** Paper §5.1: BC vs LCC vs the D4 baseline on the synthetic benchmark.
  *
  * Usage: spark-submit ... repro.jobs.SBCompare [seed]
  */
object SBCompare {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("sb-compare")
    val r = Experiments.runSB(spark, Jobs.arg(args, 0, 0L))
    println(f"graph: ${r.numValues} values, ${r.numAttrs} attrs, ${r.numEdges} edges")
    println(f"BC  top-55: ${r.bcPrf} (paper 0.69)")
    println(f"LCC top-55: ${r.lccPrf} (paper: mostly non-homographs)")
    println(f"D4        : ${r.d4Prf} (paper 0.38); domains=${r.d4NumDomains} covered=${r.d4CoveredColumns}")
    println(s"BC missed (${r.missedByBc.size}, of which ${r.missedCodeHomographs} code abbreviations): " +
      r.missedByBc.toSeq.sorted.mkString(", "))
    spark.stop()
  }
}
