package repro.lake

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** One column of a lake table. `values(r)` is the string cell at row r;
  * `numeric(r)` is its parsed numeric value when the column is numerical.
  */
final case class LakeColumn(
    name: String,
    values: Vector[String],
    numeric: Option[Vector[Double]] = None,
) {
  require(numeric.forall(_.length == values.length), s"column $name: ragged numeric vector")
  def isNumeric: Boolean = numeric.isDefined
}

/** A small relational table inside the synthetic data lake. */
final case class LakeTable(id: Long, name: String, columns: Vector[LakeColumn]) {
  require(columns.nonEmpty, s"table $name has no columns")
  require(columns.map(_.values.length).distinct.size == 1, s"table $name is ragged")

  def nRows: Int = columns.head.values.length
  def nCols: Int = columns.length
  def cell(r: Int, c: Int): String = columns(c).values(r)

  /** Row r as a vector of cell strings. */
  def row(r: Int): Vector[String] = columns.map(_.values(r))
}

/** A data lake: a named collection of tables plus optional planted ground
  * truth (filled by the generator that built the lake).
  *
  * @param unionGroundTruth query table id -> ids of truly unionable tables
  */
final case class Lake(
    name: String,
    tables: Vector[LakeTable],
    unionGroundTruth: Map[Long, Set[Long]] = Map.empty,
) {
  def table(id: Long): LakeTable = tables(id.toInt)
  def nTables: Int = tables.size
  def nColumns: Long = tables.map(_.nCols.toLong).sum
  def nRows: Long = tables.map(_.nRows.toLong).sum
  def nCells: Long = tables.map(t => t.nRows.toLong * t.nCols).sum

  /** Flatten the lake into the cells DataFrame the index builder consumes:
    * (TableId, ColumnId, RowId, CellValue, NumValue). NumValue is null for
    * non-numerical cells.
    */
  def cellsDF(spark: SparkSession): DataFrame = {
    val schema = StructType(Seq(
      StructField("TableId", LongType, nullable = false),
      StructField("ColumnId", IntegerType, nullable = false),
      StructField("RowId", IntegerType, nullable = false),
      StructField("CellValue", StringType, nullable = false),
      StructField("NumValue", DoubleType, nullable = true),
    ))
    val rows = for {
      t <- tables
      c <- t.columns.indices
      col = t.columns(c)
      r <- col.values.indices
    } yield Row(
      t.id,
      c,
      r,
      col.values(r),
      col.numeric.map(n => java.lang.Double.valueOf(n(r))).orNull,
    )
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 8), schema)
  }
}
