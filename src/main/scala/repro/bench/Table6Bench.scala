package repro.bench

import org.apache.spark.sql.SparkSession

import repro.baselines.StarmieLike
import repro.core._
import repro.lake.LakeGen
import repro.tasks.Tasks

/** Table VI — union-search quality: BLEND's SC+Counter plan vs. the
  * Starmie substitute, measured as P@k, Recall@k and MAP@k on the three
  * clustered union lakes (k = 10, 20 everywhere; 50, 100 on the TUS-style
  * lakes, as in the paper). Fig. 7 (runtime curves) is out of scope but the
  * mean runtimes are printed for reference.
  */
object Table6Bench {

  final case class Cell(p: Double, recall: Double, map: Double)
  final case class Row(lake: String, k: Int, blend: Cell, starmie: Cell, paper: String)
  final case class Result(rows: Seq[Row], blendMs: Double, starmieMs: Double, report: String)

  private val paperNotes = Map(
    ("SANTOS", 10) -> "paper: B 92/70/94 S 97/73/99",
    ("SANTOS", 20) -> "paper: B 100/89/94 S 97/95/98",
    ("TUS", 10) -> "paper: B 94/05/94 S 95/06/98",
    ("TUS", 20) -> "paper: B 95/10/94 S 92/10/96",
    ("TUS", 50) -> "paper: B 96/24/95 S 90/23/93",
    ("TUS", 100) -> "paper: B 93/43/92 S 81/38/90",
    ("TUS Large", 10) -> "paper: B 94/04/94 S 93/04/97",
    ("TUS Large", 20) -> "paper: B 94/07/94 S 90/07/94",
    ("TUS Large", 50) -> "paper: B 92/17/93 S 85/15/90",
    ("TUS Large", 100) -> "paper: B 92/32/92 S 77/26/85",
  )

  def run(spark: SparkSession): Result = {
    val d = BenchData(spark)
    val lakes = Seq(
      ("SANTOS", d.santos, d.santosIdx, Seq(10, 20)),
      ("TUS", d.tus, d.tusIdx, Seq(10, 20, 50, 100)),
      ("TUS Large", d.tusLarge, d.tusLargeIdx, Seq(10, 20, 50, 100)),
    )

    var blendMsTotal = 0.0
    var starmieMsTotal = 0.0
    var nQueries = 0

    val rows = lakes.flatMap { case (name, u: LakeGen.UnionLake, idx, ks) =>
      val starmieIdx = StarmieLike.build(u.lake)
      val exec = new Executor(spark, idx, CostModel.untrained, optimize = true)

      // Per query: full rankings from both systems, self excluded.
      val perQuery = u.queries.map { q =>
        val cols = u.lake.table(q).columns.filterNot(_.isNumeric).map(_.values: Seq[String])
        val (bRes, bMs) = BenchUtil.time(
          exec.execute(Tasks.unionSearchPlan(cols, perColumnK = 600, k = -1)))
        val (sRes, sMs) = BenchUtil.time(
          StarmieLike.queryTable(starmieIdx, u.lake.table(q), k = -1))
        blendMsTotal += bMs; starmieMsTotal += sMs; nQueries += 1
        val blendRank = bRes("result").map(_.tableId).filterNot(_ == q)
        val starmieRank = sRes.map(_.tableId).filterNot(_ == q)
        (blendRank, starmieRank, u.lake.unionGroundTruth(q))
      }

      ks.map { k =>
        def cell(pick: ((Seq[Long], Seq[Long], Set[Long])) => Seq[Long]): Cell = {
          val ps = perQuery.map { t => Metrics.precisionAtK(pick(t), t._3, k) }
          val rs = perQuery.map { t => Metrics.recallAtK(pick(t), t._3, k) }
          val m = Metrics.mapAtK(perQuery.map(t => (pick(t), t._3)), k)
          Cell(BenchUtil.mean(ps), BenchUtil.mean(rs), m)
        }
        Row(name, k, cell(_._1), cell(_._2),
          paperNotes.getOrElse((name, k), ""))
      }
    }

    val tab = BenchUtil.table(
      Seq("Lake", "k", "BLEND P@k", "BLEND R", "BLEND MAP", "Starmie P@k", "Starmie R", "Starmie MAP", "Paper (P/R/MAP %)"),
      rows.map(r => Seq(r.lake, r.k.toString,
        BenchUtil.pct(r.blend.p), BenchUtil.pct(r.blend.recall), BenchUtil.pct(r.blend.map),
        BenchUtil.pct(r.starmie.p), BenchUtil.pct(r.starmie.recall), BenchUtil.pct(r.starmie.map),
        r.paper)))
    val report = tab +
      f"\n\nmean runtime per query: BLEND ${blendMsTotal / nQueries / 1000}%.2f s, " +
      f"Starmie ${starmieMsTotal / nQueries / 1000}%.3f s " +
      "(paper Fig. 7: Starmie faster everywhere except TUS Large)"
    Result(rows, blendMsTotal / nQueries, starmieMsTotal / nQueries,
      BenchUtil.report("table6-union", report))
  }
}
