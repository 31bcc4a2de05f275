package repro.core

import repro.{Oracle, SparkSpec}
import repro.lake.DataLake
import org.apache.spark.sql.functions._

class LakeGraphSpec extends SparkSpec {

  private def smallLake = DataLake.ofColumns(spark,
    "T1.a" -> Seq("x", "y", "z", "x"),   // x repeats within the column
    "T1.b" -> Seq(" y ", "w"),           // y with whitespace -> normalized
    "T2.c" -> Seq("X", "q"),             // x lower/upper -> same node
  )

  test("normalization trims, upper-cases, and drops empty/null values") {
    import spark.implicits._
    val lake = DataLake.ofColumns(spark, "T.a" -> Seq("  a b ", "", "   ", "B", "a b"))
    val cells = LakeGraph.normalizedCells(lake).as[(String, String)].collect()
    assert(cells.map(_._2).toSet === Set("A B", "B"))
    assert(cells.count(_._2 == "A B") === 2)
  }

  test("build drops values occurring once and deduplicates edges") {
    import spark.implicits._
    val g = LakeGraph.build(smallLake)
    val vals = g.values.as[(String, Long)].collect().map(_._1).toSet
    // kept: X (3 cells), Y (2 cells); dropped singletons: z, w, q
    assert(vals === Set("X", "Y"))
    // X: edges to T1.a and T2.c (the within-column repeat dedupes); Y: T1.a, T1.b
    assert(g.numEdges === 4)
  }

  test("node ids are contiguous and bipartite-partitioned") {
    import spark.implicits._
    val g = LakeGraph.build(smallLake)
    val vIds = g.values.as[(String, Long)].collect().map(_._2).sorted
    val aIds = g.attrs.as[(String, Long)].collect().map(_._2).sorted
    assert(vIds.toSeq === (0L until g.numValues))
    assert(aIds.toSeq === (g.numValues until g.numValues + g.numAttrs))
  }

  test("graph build is deterministic") {
    import spark.implicits._
    val g1 = LakeGraph.build(smallLake)
    val g2 = LakeGraph.build(smallLake)
    assert(g1.values.as[(String, Long)].collect().sortBy(_._2).toSeq ===
           g2.values.as[(String, Long)].collect().sortBy(_._2).toSeq)
    assert(g1.edges.as[(Long, Long)].collect().toSet === g2.edges.as[(Long, Long)].collect().toSet)
  }

  test("value degrees and attribute cardinalities agree with DuckDB") {
    val lake = DataLake.ofColumns(spark,
      "T.a" -> Seq("x", "y", "z"),
      "T.b" -> Seq("x", "y"),
      "U.c" -> Seq("x", "k", "k"))
    val cells = LakeGraph.normalizedCells(lake)
    val edges = cells.distinct()
    val degrees = edges.groupBy("value").agg(count(lit(1)).as("degree"))
    Oracle.assertEquivalent(
      degrees,
      "SELECT value, count(*) AS degree FROM (SELECT DISTINCT attribute, value FROM cells) GROUP BY value",
      "cells" -> cells)
    val cards = edges.groupBy("attribute").agg(count(lit(1)).as("cardinality"))
    Oracle.assertEquivalent(
      cards,
      "SELECT attribute, count(*) AS cardinality FROM (SELECT DISTINCT attribute, value FROM cells) GROUP BY attribute",
      "cells" -> cells)
  }

  test("candidateValues are exactly the values in >=2 attributes") {
    import spark.implicits._
    val lake = DataLake.ofColumns(spark,
      "T.a" -> Seq("x", "y", "y"),
      "T.b" -> Seq("x", "z", "z"))
    val g = LakeGraph.build(lake)
    val cands = g.candidateValues.select("value").as[String].collect().toSet
    assert(cands === Set("X")) // y and z repeat but only within one column
  }

  test("pruning with minOccurrences=1 keeps every distinct value") {
    val g = LakeGraph.build(smallLake, minOccurrences = 1)
    assert(g.numValues === 5) // X, Y, Z, W, Q ("X" and "x" merge)
  }

  test("CSR matches the DataFrame edge list") {
    import spark.implicits._
    val g = LakeGraph.build(smallLake, minOccurrences = 1)
    val csr = BipartiteGraph.toCsr(g)
    assert(csr.numNodes === g.numNodes.toInt)
    assert(csr.numEdges === g.numEdges.toInt)
    val dfEdges = g.edges.as[(Long, Long)].collect()
      .map { case (v, a) => (v.toInt, a.toInt) }.toSet
    val csrEdges = (0 until csr.numValues).flatMap(v => csr.neighborsOf(v).map(a => (v, a))).toSet
    assert(csrEdges === dfEdges)
  }

  test("GraphX degrees agree with DataFrame degrees") {
    val g = LakeGraph.build(smallLake, minOccurrences = 1)
    val gx = BipartiteGraph.toGraphX(g)
    val gxDegrees = gx.degrees.collect().toMap
    import spark.implicits._
    val dfDegrees = g.edges.groupBy("valueId").agg(count(lit(1)).as("d"))
      .as[(Long, Long)].collect().toMap
    dfDegrees.foreach { case (id, d) =>
      assert(gxDegrees(id) === d.toInt, s"valueId=$id")
    }
  }

  test("GraphX marks value vertices true and attribute vertices false") {
    val g = LakeGraph.build(smallLake, minOccurrences = 1)
    val gx = BipartiteGraph.toGraphX(g)
    gx.vertices.collect().foreach { case (id, isValue) =>
      assert(isValue === (id < g.numValues))
    }
  }
}
