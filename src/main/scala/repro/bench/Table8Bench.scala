package repro.bench

import java.nio.file.{Files, Path}

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.col

import repro.baselines._
import repro.core.AllTables
import repro.lake.Lake

/** Table VIII — storage: BLEND's unified AllTables index vs. the sum of the
  * stand-alone indexes a federation needs (DataXFormer inverted index,
  * JOSIE posting lists, MATE inverted+XASH index, Starmie column vectors,
  * QCR sketches). Relational indexes are serialized as parquet, vector and
  * sketch stores as packed binary — mirroring how each original system
  * stores its state.
  */
object Table8Bench {

  final case class Row(
      lake: String,
      blendBytes: Long,
      dxfBytes: Long, josieBytes: Long, mateBytes: Long,
      starmieBytes: Long, qcrBytes: Long,
      paper: String,
  ) {
    def combinationBytes: Long = dxfBytes + josieBytes + mateBytes + starmieBytes + qcrBytes
    def saving: Double = 1.0 - blendBytes.toDouble / combinationBytes
  }

  final case class Result(rows: Seq[Row], report: String)

  private def dirSize(p: Path): Long = {
    import scala.jdk.CollectionConverters._
    if (!Files.exists(p)) 0L
    else Files.walk(p).iterator().asScala.filter(Files.isRegularFile(_)).map(Files.size).sum
  }

  def run(spark: SparkSession): Result = {
    val d = BenchData(spark)
    val tmp = Files.createTempDirectory("blend-storage")

    val lakes: Seq[(String, Lake, AllTables, String)] = Seq(
      ("gittables-lite", d.gittables.lake, d.gittablesIdx,
        "paper Gittables: BLEND 79.7 GB vs combination 575.7 GB"),
      ("santos-lite", d.santos.lake, d.santosIdx,
        "paper SANTOS: BLEND 7.9 GB vs combination 8.4 GB"),
      ("nyc-lite", d.nyc.lake, d.nycIdx,
        "paper NYC: BLEND 709.2 GB vs combination 763.0 GB"),
    )

    val rows = lakes.map { case (name, lake, idx, paper) =>
      val base = tmp.resolve(name)
      Files.createDirectories(base)

      AllTables.save(idx, base.resolve("blend").toString)
      val blend = dirSize(base.resolve("blend"))

      // DataXFormer: the bare inverted index (no super keys / quadrants).
      idx.df.select(col("CellValue"), col("TableId"), col("ColumnId"), col("RowId"))
        .write.mode("overwrite").parquet(base.resolve("dxf").toString)
      val dxf = dirSize(base.resolve("dxf"))

      val josieIdx = Josie.build(spark, lake)
      josieIdx.df.write.mode("overwrite").parquet(base.resolve("josie").toString)
      josieIdx.df.unpersist()
      val josie = dirSize(base.resolve("josie"))

      val mateIdx = Mate.build(spark, lake)
      mateIdx.df.write.mode("overwrite").parquet(base.resolve("mate").toString)
      mateIdx.df.unpersist()
      val mate = dirSize(base.resolve("mate"))

      val starmie = StarmieLike.save(StarmieLike.build(lake), base.resolve("starmie.bin"))
      val qcr = QcrBaseline.save(QcrBaseline.build(lake, h = 64), base.resolve("qcr.bin"))

      Row(name, blend, dxf, josie, mate, starmie, qcr, paper)
    }

    def mb(b: Long): String = f"${b / 1e6}%.1f MB"
    val tab = BenchUtil.table(
      Seq("Lake", "BLEND", "Combination", "Saving", "DXF", "JOSIE", "MATE", "Starmie", "QCR", "Paper"),
      rows.map(r => Seq(r.lake, mb(r.blendBytes), mb(r.combinationBytes), BenchUtil.pct(r.saving),
        mb(r.dxfBytes), mb(r.josieBytes), mb(r.mateBytes), mb(r.starmieBytes), mb(r.qcrBytes), r.paper)))
    val avg = rows.map(_.saving).sum / rows.size
    val report = tab + f"\n\naverage saving: ${avg * 100}%.1f%% (paper: 57%% less storage on average)"
    Result(rows, BenchUtil.report("table8-storage", report))
  }
}
