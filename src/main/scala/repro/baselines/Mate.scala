package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.{Scored, Xash}
import repro.lake.Lake

/** Re-implementation of the algorithmic core of MATE (VLDB'22):
  * multi-column join discovery via an inverted index augmented with XASH
  * super keys. MATE fetches every index row matching the *first* query
  * column, prunes with the super-key bloom filter in application code, and
  * exactly validates the survivors row-by-row against the candidate tables
  * — the paper's Table V counts candidates after the bloom filter, which is
  * where MATE's false positives come from.
  */
object Mate {

  /** MATE's own index relation: (CellValue, TableId, RowId, SuperKey). */
  final case class MateIndex(df: DataFrame)

  final case class MateResult(ranking: Seq[Scored], fetched: Long, tp: Long, fp: Long)

  def build(spark: SparkSession, lake: Lake): MateIndex = {
    val cells = lake.cellsDF(spark)
    val bitsUdf = udf((v: String) => Xash.cellBits(v))
    val keys = cells
      .withColumn("bits", bitsUdf(col("CellValue")))
      .groupBy("TableId", "RowId")
      .agg(expr("bit_or(bits)").as("SuperKey"))
    val df = cells
      .join(keys, Seq("TableId", "RowId"))
      .select("CellValue", "TableId", "RowId", "SuperKey")
      .cache()
    df.count()
    MateIndex(df)
  }

  /** Persist MATE's index relation — its on-disk state. */
  def save(idx: MateIndex, path: String): Unit =
    idx.df.write.mode("overwrite").parquet(path)

  /** Cold start of the stand-alone system: queries scan the on-disk store
    * (uncached), as the external MATE deployment reads its own DBMS.
    */
  def load(spark: SparkSession, path: String): MateIndex =
    MateIndex(spark.read.parquet(path))

  /** Multi-column join search for composite-key `tuples`.
    *
    * @param lake the raw lake — the application-level validation loads
    *             candidate tables from it row-by-row, like MATE's
    *             validation stage reads the lake tables
    */
  def query(idx: MateIndex, lake: Lake, tuples: Seq[Vector[String]], k: Int): MateResult = {
    val distinctTuples = tuples.toVector.distinct
    val tupleKeys = distinctTuples.map(t => Xash.tupleKey(t)).toArray
    val firstColValues = distinctTuples.map(_.head).distinct

    // Phase 1 (in-DB): rows matching any first-column value.
    val rows = idx.df
      .where(col("CellValue").isin(firstColValues: _*))
      .select(col("TableId"), col("RowId"), col("SuperKey"))
      .distinct()
      .collect()

    // Phase 2 (application): XASH bloom filter.
    val candidates = rows.filter { r =>
      val sk = r.getLong(2)
      tupleKeys.exists(tk => Xash.mayContain(sk, tk))
    }

    // Phase 3 (application): exact row-by-row validation on the lake tables.
    val byTable = candidates.groupBy(_.getLong(0))
    var tp = 0L
    var fp = 0L
    val scores = byTable.toSeq.map { case (tid, cands) =>
      val table = lake.table(tid)
      var matches = 0
      cands.foreach { c =>
        val rowSet = table.row(c.getInt(1)).toSet
        val ok = distinctTuples.exists(t => t.forall(rowSet.contains))
        if (ok) { matches += 1; tp += 1 } else fp += 1
      }
      Scored(tid, matches.toDouble)
    }

    val ranking = scores
      .filter(_.score > 0)
      .sortBy(s => (-s.score, s.tableId))
    MateResult(if (k > 0) ranking.take(k) else ranking, candidates.length.toLong, tp, fp)
  }
}
