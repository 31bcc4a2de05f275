package repro.jobs

import repro.d4.D4
import repro.data.TusGen

/** Paper §5.5 (Figure 10): impact of injected homographs on the D4
  * domain-discovery baseline.
  *
  * Usage: spark-submit ... repro.jobs.D4Impact [maxInjected]
  */
object D4Impact {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("d4-impact")
    val maxInj = Jobs.arg(args, 0, 200L).toInt
    val base = TusGen.Params(nDomains = 30, nColumns = 240, maxVocab = 1200, seed = 9)
    val spec = TusGen.tusI(seed = 9, base = base)
    println("#injected | domains | multi-domain values | avg domains/value")
    (Seq(0) ++ Iterator.iterate(50)(_ * 2).takeWhile(_ <= maxInj)).foreach { n =>
      val lakeSpec =
        if (n == 0) spec
        else TusGen.inject(spec, n, meanings = 2, minAttrCardinality = 1, seed = 77 + n).spec
      val r = D4.run(spark, lakeSpec.toLake(spark), D4.Config(tau = 0.3, dominance = 0.0))
      println(f"  $n%5d   | ${r.numDomains}%5d   | ${r.multiDomainValueCount}%8d | ${r.avgDomainsPerValue}%.4f")
    }
    spark.stop()
  }
}
