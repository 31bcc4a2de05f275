package repro.bench

import repro.SparkSpec
import repro.data.TusGen
import repro.eval.Experiments

/** Paper Table 3: % of injected homographs in the BC top-50 as the number
  * of meanings of each injected homograph grows (replaced values all from
  * attributes with cardinality >= 500). Averages of 4 seeded runs.
  *
  *   paper: 2: 97.5 | 3: 97.5 | 4: 98.5 | 5: 98.5 | 6: 100 | 7: 100 | 8: 100
  */
class Table3MeaningsBench extends SparkSpec {

  test("Table 3: injected-homograph recall vs number of meanings") {
    val base = TusGen.Params()
    val seeds = Seq(1L, 2L, 3L, 4L)
    val meaningsRange = 2 to 8
    val paper = Map(2 -> 97.5, 3 -> 97.5, 4 -> 98.5, 5 -> 98.5, 6 -> 100.0, 7 -> 100.0, 8 -> 100.0)

    println("=== Table 3: % of 50 injected homographs in BC top-50, card>=500 (avg of 4 runs) ===")
    println("#meanings | paper | measured")
    val measured = meaningsRange.map { m =>
      val pct = Experiments.injectionCell(spark, base, count = 50, meanings = m,
        minAttrCardinality = 500, seeds = seeds)
      println(f"    $m     | ${paper(m)}%5.1f | $pct%5.1f")
      m -> pct
    }.toMap

    // shape: uniformly high, and more meanings never hurts much
    meaningsRange.foreach(m => assert(measured(m) >= 90.0, s"meanings=$m gave ${measured(m)}"))
    assert(measured(8) >= measured(2) - 2.0,
      s"recall at 8 meanings (${measured(8)}) should be at least that at 2 (${measured(2)})")
  }
}
