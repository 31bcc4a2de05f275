package repro.jobs

import repro.data.TusGen
import repro.eval.Experiments

/** Paper §5.3 (Figure 7): top-k homograph retrieval on the TUS analogue.
  *
  * Usage: spark-submit ... repro.jobs.TusTopK [seed]
  */
object TusTopK {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("tus-topk")
    val r = Experiments.runTusTopK(spark, TusGen.tusParams(Jobs.arg(args, 0, 0L)))
    println(f"graph: ${r.numValues} values, ${r.numEdges} edges, ${r.numHomographs} homographs")
    println(f"P@200   = ${r.p200}%.3f (paper 0.890)")
    println(f"P@|H|   = ${r.atTruth.precision}%.3f (paper 0.622)")
    println(f"best F1 = ${r.best.f1}%.3f at k=${r.bestK} (paper 0.655 at k=29,633)")
    println("top-10:")
    r.top10.foreach { case (v, s) => println(f"  $v%-20s -> $s%.6f") }
    spark.stop()
  }
}
