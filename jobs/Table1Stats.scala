package repro.jobs

import repro.data.{SyntheticBenchmark, TusGen}
import repro.eval.Experiments

/** Paper Table 1: dataset statistics for the SB / TUS-I / TUS analogues.
  *
  * Usage: spark-submit ... repro.jobs.Table1Stats [seed]
  */
object Table1Stats {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table1-stats")
    val seed = Jobs.arg(args, 0, 0L)

    val sb = SyntheticBenchmark.generate(spark, seed)
    val sbStats = Experiments.datasetStats(spark, "SB", sb.lake, sb.tables.size,
      sb.homographs, sb.homographs.iterator.map(_ -> 2).toMap)

    val tusI = TusGen.tusI(seed)
    val tusIStats = Experiments.datasetStats(spark, "TUS-I", tusI.toLake(spark),
      tusI.numTables, Set.empty, Map.empty)

    val tus = TusGen.generate(TusGen.tusParams(seed))
    val tusStats = Experiments.datasetStats(spark, "TUS", tus.toLake(spark), tus.numTables,
      tus.homographs, tus.homographs.iterator.map(h => h -> tus.valueDomains(h).size).toMap)

    println("name  | #Tables | #Attr | #Val | #Hom | Card(H) | #M")
    Seq(sbStats, tusIStats, tusStats).foreach { s =>
      println(f"${s.name}%-5s | ${s.numTables}%7d | ${s.numAttrs}%5d | ${s.numValues}%7d | " +
        f"${s.numHomographs}%5d | ${s.cardMin}-${s.cardMax} | ${s.meaningsMin}-${s.meaningsMax}")
    }
    spark.stop()
  }
}
