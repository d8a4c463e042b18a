package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** The unified BLEND index (paper §V, Fig. 3): one relational table
  *
  * {{{
  *   AllTables(CellValue varchar, TableId long, ColumnId int, RowId int,
  *             SuperKey long, Quadrant boolean?)
  * }}}
  *
  * - (CellValue, TableId, ColumnId, RowId) is the DataXFormer inverted index;
  * - SuperKey is the XASH super key of the cell's row (MATE);
  * - Quadrant is the QCR bit: value >= its column average (null when the
  *   cell is not numerical).
  *
  * @param df        the AllTables DataFrame (cached by [[AllTables.build]])
  * @param valueFreq global frequency of each distinct cell value — the
  *                  statistic the cost model's "average frequency of values
  *                  from Q in the database" feature reads (paper §VII-B)
  * @param nCells    total number of index rows
  */
final case class AllTables(df: DataFrame, valueFreq: Map[String, Long], nCells: Long) {

  /** Average database frequency of a query's values (unknown values count
    * with frequency 0, as in the paper's feature definition).
    */
  def avgFrequency(values: Seq[String]): Double =
    if (values.isEmpty) 0.0
    else values.map(v => valueFreq.getOrElse(v, 0L)).sum.toDouble / values.size

  def unpersist(): Unit = { df.unpersist(); () }
}

object AllTables {

  /** Offline index construction (paper Fig. 2e), pure Spark:
    *  1. per-(table, column) averages over numerical cells → Quadrant bit,
    *  2. per-(table, row) `bit_or` aggregation of cell bit patterns → SuperKey,
    *  3. join both back to the inverted-index cells.
    */
  def build(spark: SparkSession, cells: DataFrame): AllTables = {
    val cellBitsUdf = udf((v: String) => Xash.cellBits(v))

    val withBits = cells.withColumn("bits", cellBitsUdf(col("CellValue")))

    val colAvg = cells
      .where(col("NumValue").isNotNull)
      .groupBy("TableId", "ColumnId")
      .agg(avg("NumValue").as("colAvg"))

    val superKeys = withBits
      .groupBy("TableId", "RowId")
      .agg(expr("bit_or(bits)").as("SuperKey"))

    val indexed = withBits
      .join(colAvg, Seq("TableId", "ColumnId"), "left")
      .join(superKeys, Seq("TableId", "RowId"))
      .select(
        col("CellValue"),
        col("TableId"),
        col("ColumnId"),
        col("RowId"),
        col("SuperKey"),
        when(col("NumValue").isNotNull, col("NumValue") >= col("colAvg"))
          .otherwise(lit(null).cast(BooleanType))
          .as("Quadrant"),
      )

    // The paper's in-DB B-tree indexes on CellValue/TableId map to a warm,
    // sorted, columnar cache here: sorting clusters equal values so the
    // cached batches behave like the column store the paper deploys on.
    val df = indexed.sort("CellValue", "TableId", "RowId").cache()
    val nCells = df.count()

    val valueFreq = df
      .groupBy("CellValue")
      .count()
      .collect()
      .map(r => r.getString(0) -> r.getLong(1))
      .toMap

    AllTables(df, valueFreq, nCells)
  }

  /** Persist the index as parquet — used by jobs and the Table VIII storage
    * measurement.
    */
  def save(index: AllTables, path: String): Unit =
    index.df.write.mode("overwrite").parquet(path)

  /** Reload a saved index (recomputing the frequency statistics). */
  def load(spark: SparkSession, path: String): AllTables = {
    val df = spark.read.parquet(path).cache()
    val nCells = df.count()
    val valueFreq = df.groupBy("CellValue").count()
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    AllTables(df, valueFreq, nCells)
  }
}
