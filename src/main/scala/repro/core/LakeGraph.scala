package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.lake.DataLake

/** The DomainNet bipartite graph, relational view.
  *
  * Node ids are contiguous: value nodes occupy `[0, numValues)` and
  * attribute nodes `[numValues, numValues + numAttrs)`, so centrality
  * kernels can use dense arrays indexed by node id.
  *
  * @param values  DataFrame `(value: String, id: Long)` — one row per
  *                distinct normalized value kept after preprocessing
  * @param attrs   DataFrame `(attribute: String, id: Long)`
  * @param edges   DataFrame `(valueId: Long, attrId: Long)` — distinct
  *                bipartite edges
  * @param numValues number of value nodes
  * @param numAttrs  number of attribute nodes
  */
final case class LakeGraph(
    values: DataFrame,
    attrs: DataFrame,
    edges: DataFrame,
    numValues: Long,
    numAttrs: Long) {

  def numNodes: Long = numValues + numAttrs

  def numEdges: Long = edges.count()

  /** Edges with the string forms joined back in: `(value, attribute, valueId, attrId)`. */
  def namedEdges: DataFrame =
    edges.join(values, "valueId").join(attrs, "attrId")
      .select("value", "attribute", "valueId", "attrId")

  /** Per-value number of attributes it appears in (the value node degree). */
  def valueDegrees: DataFrame =
    edges.groupBy("valueId").agg(count(lit(1)).as("degree"))

  /** Per-attribute number of distinct values (the attribute cardinality). */
  def attrCardinalities: DataFrame =
    edges.groupBy("attrId").agg(count(lit(1)).as("cardinality"))

  /** Values appearing in at least two attributes — the homograph candidates. */
  def candidateValues: DataFrame =
    valueDegrees.filter(col("degree") >= 2).join(values, "valueId").select("value", "valueId", "degree")
}

object LakeGraph {

  /** Normalize a raw cell value the way the paper does: treat it as a
    * single string, trim surrounding whitespace, upper-case it. Empty and
    * null values normalize to null (dropped from the graph).
    */
  val normalizeCol: org.apache.spark.sql.Column => org.apache.spark.sql.Column =
    c => {
      val t = upper(trim(c))
      when(t.isNull || t === "", lit(null)).otherwise(t)
    }

  /** Normalized, non-null cells of a lake: `(attribute, value)`. */
  def normalizedCells(lake: DataLake): DataFrame =
    lake.cells
      .select(col("attribute"), normalizeCol(col("value")).as("value"))
      .filter(col("value").isNotNull)

  /** Build the bipartite graph.
    *
    * Preprocessing per the paper (§5): values that occur exactly once in
    * the whole lake are dropped — they cannot be homographs and only slow
    * down centrality computation. Values occurring multiple times (even in
    * a single attribute) are kept.
    *
    * @param minOccurrences minimum number of *cells* a value must occupy to
    *                       be kept (paper uses 2)
    */
  def build(lake: DataLake, minOccurrences: Int = 2): LakeGraph = {
    val spark = lake.cells.sparkSession
    val cells = normalizedCells(lake)

    val kept = cells
      .groupBy("value")
      .agg(count(lit(1)).as("occ"))
      .filter(col("occ") >= minOccurrences)
      .select("value")

    val edgesStr = cells.join(kept, "value").select("value", "attribute").distinct()

    // Deterministic contiguous ids: sort then zip. zipWithIndex avoids a
    // single-partition window at lake scale.
    val values = zipId(edgesStr.select("value").distinct().orderBy("value"), "value", "valueId", 0L)
    val nv = values.count()
    val attrs = zipId(edgesStr.select("attribute").distinct().orderBy("attribute"), "attribute", "attrId", nv)
    val na = attrs.count()

    val edges = edgesStr
      .join(values, "value")
      .join(attrs, "attribute")
      .select("valueId", "attrId")

    LakeGraph(values, attrs, edges, nv, na)
  }

  private def zipId(sorted: DataFrame, colName: String, idName: String, offset: Long): DataFrame = {
    val spark = sorted.sparkSession
    import spark.implicits._
    val rdd = sorted.select(colName).as[String].rdd.zipWithIndex()
      .map { case (v, i) => (v, i + offset) }
    rdd.toDF(colName, idName)
  }
}
