package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Paper §5.1 (Figures 5-6 + in-text): on the synthetic benchmark SB,
  * DomainNet with exact BC reaches P=R=F1=69% at top-55 while the
  * D4-based baseline reaches 38% and LCC ranks mostly non-homographs in
  * its top-55 (<25% precision). The homographs BC misses are the
  * country/state-code abbreviations from the two small domains.
  */
class SBCompareBench extends SparkSpec {

  test("SB: BC top-55 beats D4 beats/matches LCC (paper: 69% vs 38% vs <25%)") {
    val r = Experiments.runSB(spark, seed = 0)
    println("=== SB comparison (top-55) ===")
    println(f"graph: ${r.numValues} values, ${r.numAttrs} attrs, ${r.numEdges} edges")
    println(f"BC   paper P=R=F1=0.69  | measured ${r.bcPrf}")
    println(f"LCC  paper P@55<0.25    | measured ${r.lccPrf}")
    println(f"D4   paper P=R=F1=0.38  | measured ${r.d4Prf} (flagged=${r.d4Flagged}, domains=${r.d4NumDomains}, covered cols=${r.d4CoveredColumns})")
    println(f"BC misses ${r.missedByBc.size} homographs, of which ${r.missedCodeHomographs} are small-domain code abbreviations")
    println(s"BC missed: ${r.missedByBc.toSeq.sorted.mkString(", ")}")

    // shape assertions: BC clearly ahead of both baselines; misses are
    // dominated by the small code domains
    assert(r.bcPrf.precision > 0.5, s"BC ${r.bcPrf}")
    assert(r.bcPrf.precision > r.d4Prf.f1 + 0.1, s"BC ${r.bcPrf} vs D4 ${r.d4Prf}")
    assert(r.bcPrf.precision > r.lccPrf.precision + 0.2, s"BC ${r.bcPrf} vs LCC ${r.lccPrf}")
    assert(r.missedCodeHomographs >= r.missedByBc.size / 2,
      s"missed=${r.missedByBc.size} code=${r.missedCodeHomographs}")
  }
}
