package repro

/** Smoke test: the shared SparkSession boots and runs a trivial query,
  * and the DuckDB oracle agrees with Spark on a tiny aggregation.
  */
class SmokeSpec extends SparkSpec {
  test("SparkSession boots and evaluates a trivial query") {
    import spark.implicits._
    assert(spark.range(10).count() === 10L)
    assert(Seq(("a", 1), ("b", 2)).toDF("k", "v").count() === 2L)
  }

  test("DuckDB oracle agrees with Spark on a tiny aggregation") {
    import spark.implicits._
    val df = Seq(("a", 1), ("a", 2), ("b", 3)).toDF("k", "v")
    val agg = df.groupBy("k").count().withColumnRenamed("count", "cnt")
    Oracle.assertEquivalent(agg, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
  }
}
