package repro.jobs

import repro.data.TusGen
import repro.eval.Experiments

/** Paper Table 3: % of injected homographs in the BC top-50 vs the number
  * of meanings, with replaced values from attributes of cardinality >= 500.
  *
  * Usage: spark-submit ... repro.jobs.Table3Meanings [numRuns]
  */
object Table3Meanings {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table3-meanings")
    val runs = Jobs.arg(args, 0, 4L).toInt
    val seeds = (1 to runs).map(_.toLong)
    val base = TusGen.Params()
    val paper = Map(2 -> "97.5", 3 -> "97.5", 4 -> "98.5", 5 -> "98.5", 6 -> "100", 7 -> "100", 8 -> "100")
    println("#meanings | % injected homographs in top-50 (paper)")
    (2 to 8).foreach { m =>
      val pct = Experiments.injectionCell(spark, base, 50, m, 500, seeds)
      println(f"    $m     | $pct%5.1f (${paper(m)})")
    }
    spark.stop()
  }
}
