package repro.bench

import repro.SparkSpec
import repro.data.TusGen
import repro.eval.Experiments

/** Paper Table 2: % of the 50 injected homographs appearing in the BC
  * top-50, as the minimum cardinality of the attributes whose values are
  * replaced grows. Averages of 4 seeded runs, like the paper.
  *
  *   paper: >0: 85.0  | >=100: 93.5 | >=200: 93.5 | >=300: 95.0
  *          | >=400: 94.5 | >=500: 97.5
  */
class Table2CardinalityBench extends SparkSpec {

  test("Table 2: injected-homograph recall vs attribute-cardinality threshold") {
    val base = TusGen.Params() // 1/4-scale TUS-I analogue
    val seeds = Seq(1L, 2L, 3L, 4L)
    val thresholds = Seq(1, 100, 200, 300, 400, 500)
    val paper = Map(1 -> 85.0, 100 -> 93.5, 200 -> 93.5, 300 -> 95.0, 400 -> 94.5, 500 -> 97.5)

    println("=== Table 2: % of 50 injected homographs in BC top-50 (avg of 4 runs) ===")
    println("threshold | paper | measured")
    val measured = thresholds.map { t =>
      val pct = Experiments.injectionCell(spark, base, count = 50, meanings = 2,
        minAttrCardinality = t, seeds = seeds)
      println(f"  >=$t%4d  | ${paper(t)}%5.1f | $pct%5.1f")
      t -> pct
    }.toMap

    // shape: high everywhere, increasing with the threshold, near-perfect at >=500
    assert(measured(1) >= 70.0, s"threshold>0 gave ${measured(1)}")
    assert(measured(500) >= 90.0, s"threshold>=500 gave ${measured(500)}")
    assert(measured(500) >= measured(1), "recall should not decrease with the threshold")
    val highThresholdAvg = Seq(300, 400, 500).map(measured).sum / 3
    val lowThresholdAvg = Seq(1, 100).map(measured).sum / 2
    assert(highThresholdAvg >= lowThresholdAvg - 1.0,
      f"high-threshold avg $highThresholdAvg%.1f should be >= low-threshold avg $lowThresholdAvg%.1f")
  }
}
