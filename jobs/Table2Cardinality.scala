package repro.jobs

import repro.data.TusGen
import repro.eval.Experiments

/** Paper Table 2: % of 50 injected homographs in the BC top-50 vs the
  * cardinality threshold of the attributes whose values are replaced.
  *
  * Usage: spark-submit ... repro.jobs.Table2Cardinality [numRuns]
  */
object Table2Cardinality {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table2-cardinality")
    val runs = Jobs.arg(args, 0, 4L).toInt
    val seeds = (1 to runs).map(_.toLong)
    val base = TusGen.Params()
    println("threshold | % injected homographs in top-50 (paper)")
    val paper = Map(1 -> "85.0", 100 -> "93.5", 200 -> "93.5", 300 -> "95.0", 400 -> "94.5", 500 -> "97.5")
    Seq(1, 100, 200, 300, 400, 500).foreach { t =>
      val pct = Experiments.injectionCell(spark, base, 50, 2, t, seeds)
      println(f"  >=$t%4d  | $pct%5.1f (${paper(t)})")
    }
    spark.stop()
  }
}
