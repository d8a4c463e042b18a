package repro.bench

import org.apache.spark.sql.SparkSession

import repro.lake.Lake

/** Table II — statistics of the data lakes. The paper lists the original
  * corpora; we print the synthetic stand-ins next to the originals they
  * replace (see DESIGN.md "Substitutions").
  */
object Table2Bench {

  final case class LakeStats(name: String, paper: String, tables: Long, columns: Long, rows: Long)

  final case class Result(stats: Seq[LakeStats], report: String)

  /** Paper Table II values for the lakes we model. */
  private val paperStats = Map(
    "dwtc-lite" -> "DWTC: 145M tables, 760M columns, 1.5B rows",
    "gittables-lite" -> "Gittables: 1.5M tables, 16.8M columns, 345M rows",
    "opendata-lite" -> "German Open Data: 17,144 tables, 440K columns, 62M rows",
    "tus-lite" -> "TUS: 1,530 tables, 14.8K columns, 6.8M rows",
    "tuslarge-lite" -> "TUS Large: 5,043 tables, 55K columns, 9.6M rows",
    "santos-lite" -> "SANTOS: 550 tables, 6,322 columns, 3.8M rows",
    "nyc-lite" -> "NYC open data: 1,063 tables, 16K columns, 290M rows",
  )

  def run(spark: SparkSession): Result = {
    val d = BenchData(spark)
    val lakes: Seq[Lake] = Seq(
      d.dwtc.lake, d.gittables.lake, d.opendata.lake,
      d.tus.lake, d.tusLarge.lake, d.santos.lake, d.nyc.lake)

    val stats = lakes.map { l =>
      LakeStats(l.name, paperStats(l.name), l.nTables.toLong, l.nColumns, l.nRows)
    }
    val rows = stats.map(s =>
      Seq(s.name, s.tables.toString, s.columns.toString, s.rows.toString, s.paper))
    val report = BenchUtil.table(
      Seq("Lake (ours)", "Tables", "Columns", "Rows", "Replaces (paper Table II)"), rows)
    Result(stats, BenchUtil.report("table2-lakes", report))
  }
}
