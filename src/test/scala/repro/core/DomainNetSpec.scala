package repro.core

import repro.SparkSpec
import repro.lake.DataLake

class DomainNetSpec extends SparkSpec {

  /** Two domains bridged by one homograph plus an unambiguous repeat. */
  private def lake = DataLake.ofColumns(spark,
    "T1.animal" -> Seq("JAGUAR", "DOG", "FOX", "OWL", "DOG", "FOX", "OWL", "JAGUAR"),
    "T2.animal" -> Seq("DOG", "FOX", "OWL", "EMU", "DOG", "FOX", "OWL", "EMU"),
    "T1.car" -> Seq("JAGUAR", "FIAT", "AUDI", "OPEL", "FIAT", "AUDI", "OPEL", "JAGUAR"),
    "T2.car" -> Seq("FIAT", "AUDI", "OPEL", "SAAB", "FIAT", "AUDI", "OPEL", "SAAB"),
  )

  test("run with exact BC ranks the bridging homograph first") {
    val res = DomainNet.run(spark, lake, DomainNet.ExactBC)
    assert(res.topK(1) === Seq("JAGUAR"))
  }

  test("run with approximate BC agrees with exact on the top candidate") {
    val res = DomainNet.run(spark, lake, DomainNet.ApproxBC(numSamples = 6, seed = 3))
    assert(res.topK(1) === Seq("JAGUAR"))
  }

  test("run with LCC ranks the homograph lowest-coefficient first") {
    val res = DomainNet.run(spark, lake, DomainNet.LCC)
    assert(res.topK(1) === Seq("JAGUAR"))
  }

  test("scores DataFrame has one ranked row per value node") {
    val res = DomainNet.run(spark, lake, DomainNet.ExactBC)
    import spark.implicits._
    val rows = res.scores.select("rank").as[Long].collect().sorted
    assert(rows.toSeq === (1L to res.graph.numValues))
  }

  test("ranking is deterministic across runs") {
    val r1 = DomainNet.run(spark, lake, DomainNet.ExactBC).topK(8)
    val r2 = DomainNet.run(spark, lake, DomainNet.ExactBC).topK(8)
    assert(r1 === r2)
  }

  test("BC scores in the result are normalized to [0, 1]") {
    val res = DomainNet.run(spark, lake, DomainNet.ExactBC)
    import spark.implicits._
    val scores = res.scores.select("score").as[Double].collect()
    assert(scores.forall(s => s >= 0.0 && s <= 1.0))
  }

  test("score() reuses a pre-built graph consistently with run()") {
    val graph = LakeGraph.build(lake)
    val csr = BipartiteGraph.toCsr(graph)
    val viaScore = DomainNet.score(spark, graph, csr, DomainNet.ExactBC).topK(5)
    val viaRun = DomainNet.run(spark, lake, DomainNet.ExactBC).topK(5)
    assert(viaScore === viaRun)
  }
}
