package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.Scored
import repro.lake.Lake

/** Re-implementation of the algorithmic core of JOSIE (SIGMOD'19):
  * single-column join discovery by exact overlap-set similarity over
  * posting lists. The index is JOSIE's own structure — distinct
  * (value, table, column) postings plus per-column set sizes — kept
  * separate from BLEND's unified index, as in the paper's federated
  * baselines.
  */
object Josie {

  /** @param df       posting lists: (CellValue, TableId, ColumnId), distinct
    * @param setSizes  distinct-value count per (TableId, ColumnId)
    */
  final case class JosieIndex(df: DataFrame, setSizes: Map[(Long, Int), Int])

  def build(spark: SparkSession, lake: Lake): JosieIndex = {
    val postings = lake
      .cellsDF(spark)
      .select("CellValue", "TableId", "ColumnId")
      .distinct()
      .cache()
    postings.count()
    val sizes = postings
      .groupBy("TableId", "ColumnId")
      .count()
      .collect()
      .map(r => (r.getLong(0), r.getInt(1)) -> r.getLong(2).toInt)
      .toMap
    JosieIndex(postings, sizes)
  }

  /** Persist the posting lists — JOSIE's on-disk state. */
  def save(idx: JosieIndex, path: String): Unit =
    idx.df.write.mode("overwrite").parquet(path)

  /** Cold start of the stand-alone system: read the postings from disk
    * (uncached — every query scans the on-disk store, like an external tool
    * would) and rebuild the set-size statistics.
    */
  def load(spark: SparkSession, path: String): JosieIndex = {
    val df = spark.read.parquet(path)
    val sizes = df
      .groupBy("TableId", "ColumnId")
      .count()
      .collect()
      .map(r => (r.getLong(0), r.getInt(1)) -> r.getLong(2).toInt)
      .toMap
    JosieIndex(df, sizes)
  }

  /** Top-k tables with a column overlapping the query set the most. */
  def query(idx: JosieIndex, values: Seq[String], k: Int): Seq[Scored] = {
    val distinctValues = values.distinct
    val perColumn = idx.df
      .where(col("CellValue").isin(distinctValues: _*))
      .groupBy("TableId", "ColumnId")
      .agg(count(lit(1)).as("ov"))
      .groupBy("TableId")
      .agg(max("ov").as("score"))
      .collect()
      .map(r => Scored(r.getLong(0), r.getLong(1).toDouble))
      .toSeq
      .sortBy(s => (-s.score, s.tableId))
    if (k > 0) perColumn.take(k) else perColumn
  }
}
