package repro.lake

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A data lake: a bag of table cells, each cell a (attribute, value) pair.
  *
  * The paper's input is "a set of raw data tables from relational
  * databases, CSV files, or any other open data format" with possibly
  * missing or ambiguous metadata. The only structure DomainNet consumes is
  * which values occur in which columns, so the lake is represented
  * uniformly as a *cells* DataFrame with schema:
  *
  *   - `attribute: String` — globally unique column id, `"<table>.<column>"`
  *   - `value: String`     — the raw cell value rendered as a string
  *
  * Cells are NOT deduplicated here; multiplicity is needed by the paper's
  * preprocessing rule (drop values occurring exactly once in the lake).
  */
final case class DataLake(cells: DataFrame, numTables: Int) {

  /** Number of distinct attributes (columns) in the lake. */
  def numAttributes: Long = cells.select("attribute").distinct().count()
}

object DataLake {

  /** Build a lake from named tables. Every column of every table becomes an
    * attribute named `"<table>.<column>"`; every cell is cast to string.
    * Null cells are kept here (graph construction filters them) so that
    * cell counts match the raw tables.
    */
  def fromTables(tables: Seq[(String, DataFrame)]): DataLake = {
    require(tables.nonEmpty, "a data lake needs at least one table")
    val cellDfs = tables.map { case (tname, df) =>
      val cols = df.columns
      require(cols.nonEmpty, s"table $tname has no columns")
      // Unpivot: one row per cell, labelled with its attribute id. An array
      // of structs (not a map) so null cell values survive the explode.
      val structs = cols.map { c =>
        struct(lit(s"$tname.$c").as("attribute"), col(c).cast("string").as("value"))
      }
      df.select(explode(array(structs.toIndexedSeq: _*)).as("cell"))
        .select(col("cell.attribute").as("attribute"), col("cell.value").as("value"))
    }
    DataLake(cellDfs.reduce(_.unionByName(_)), tables.size)
  }

  /** Build a lake directly from a cells DataFrame (columns `attribute`,
    * `value`). Used by the large synthetic generators which never
    * materialize wide tables.
    */
  def fromCells(cells: DataFrame, numTables: Int): DataLake = {
    val cols = cells.columns.toSet
    require(cols.contains("attribute") && cols.contains("value"),
      s"cells must have columns (attribute, value); got ${cells.columns.mkString(",")}")
    DataLake(cells.select(col("attribute"), col("value").cast("string")), numTables)
  }

  /** Convenience for tests: build a lake from in-memory columns. */
  def ofColumns(spark: SparkSession, columns: (String, Seq[String])*): DataLake = {
    import spark.implicits._
    val cells = columns.flatMap { case (attr, vals) => vals.map(v => (attr, v)) }
    val numTables = columns.map(_._1.split("\\.")(0)).distinct.size
    DataLake(cells.toDF("attribute", "value"), numTables)
  }
}
