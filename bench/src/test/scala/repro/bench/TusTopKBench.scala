package repro.bench

import repro.SparkSpec
import repro.data.TusGen
import repro.eval.Experiments

/** Paper §5.3 (Figure 7 + in-text numbers) on the TUS benchmark with its
  * natural homographs:
  *
  *   - precision at k=200 is 0.89;
  *   - at k = #homographs (26,035): P = R = F1 = 0.622;
  *   - the best F1 is 0.655 at k = 29,633;
  *   - the top-10 values are all homographs.
  */
class TusTopKBench extends SparkSpec {

  test("TUS: top-k homograph retrieval with approximate BC") {
    val r = Experiments.runTusTopK(spark, TusGen.tusParams(seed = 0))
    println("=== TUS top-k (natural homographs, approximate BC) ===")
    println(f"graph: ${r.numValues} values, ${r.numEdges} edges, ${r.numHomographs} true homographs")
    println(f"P@200          paper 0.890 | measured ${r.p200}%.3f")
    println(f"P=R=F1@|H|     paper 0.622 | measured ${r.atTruth.precision}%.3f (k=${r.numHomographs})")
    println(f"best F1        paper 0.655 @ k=29,633 | measured ${r.best.f1}%.3f @ k=${r.bestK}")
    println("top-10 by BC (paper: all 10 are homographs):")
    r.top10.foreach { case (v, s) => println(f"  $v%-20s -> $s%.6f") }
    println(s"top-10 all homographs: ${r.top10AllHomographs}")

    assert(r.p200 >= 0.75, s"P@200=${r.p200}")
    assert(r.atTruth.precision >= 0.45, s"P@|H|=${r.atTruth.precision}")
    assert(r.best.f1 >= r.atTruth.f1)
    assert(r.p200 > r.atTruth.precision, "precision should decay with k")
    assert(r.top10.count { case (v, _) => v.startsWith("SHARED_") } >= 8,
      "top-10 should be dominated by true homographs")
  }
}
