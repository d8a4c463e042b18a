package repro.bench

import org.apache.spark.sql.SparkSession

import repro.baselines.QcrBaseline
import repro.core._
import repro.lake.LakeGen

/** Table VII — correlation-based discovery on nyc-lite: P@10 and R@10 for
  * BLEND (convenience sampling over the naturally ordered index),
  * BLEND (rand) (same query over the apriori-shuffled index) and the QCR
  * sketch baseline, on a categorical-key benchmark (NYC Cat.) and a
  * mixed-key benchmark (NYC All). Ground truth is the exact Pearson
  * correlation computed over the joined pairs.
  */
object Table7Bench {

  final case class SysCell(p: Double, r: Double, ms: Double)
  final case class Row(bench: String, blend: SysCell, blendRand: SysCell, baseline: SysCell, paper: String)
  final case class Result(rows: Seq[Row], report: String)

  private val H = 64
  private val MinPairs = 5

  /** Exact ground truth: top-10 tables by best |pearson| between the query
    * target and any non-key numerical column, joined on the key column.
    */
  private def groundTruth(lake: repro.lake.Lake, q: LakeGen.CorrQuery): Set[Long] = {
    val keyToTarget = q.keys.zip(q.targets).toMap
    val scored = lake.tables.flatMap { t =>
      val keyVals = t.columns.head.values
      val best = t.columns.zipWithIndex.drop(1).collect {
        case (c, _) if c.isNumeric =>
          val pairs = keyVals.zip(c.numeric.get).collect {
            case (k, v) if keyToTarget.contains(k) => (keyToTarget(k), v)
          }
          if (pairs.size < MinPairs) 0.0
          else math.abs(Metrics.pearson(pairs.map(_._1), pairs.map(_._2)))
      }
      val b = if (best.isEmpty) 0.0 else best.max
      if (b > 0.0) Some(t.id -> b) else None
    }
    scored.sortBy(s => (-s._2, s._1)).take(10).map(_._1).toSet
  }

  def run(spark: SparkSession): Result = {
    val d = BenchData(spark)
    val nyc = d.nyc
    val qcrIdx = QcrBaseline.build(nyc.lake, h = H)

    def evalSystem(queries: Seq[LakeGen.CorrQuery], f: LakeGen.CorrQuery => Seq[Scored]): SysCell = {
      var p = 0.0; var r = 0.0; var ms = 0.0
      queries.foreach { q =>
        val truth = groundTruth(nyc.lake, q)
        val (res, t) = BenchUtil.time(f(q))
        val pred = res.map(_.tableId)
        p += Metrics.precisionAtK(pred, truth, 10)
        r += Metrics.recallAtK(pred, truth, 10)
        ms += t
      }
      SysCell(p / queries.size, r / queries.size, ms / queries.size)
    }

    def blendOn(idx: AllTables)(q: LakeGen.CorrQuery): Seq[Scored] =
      CorrSeeker("c", q.keys, q.targets, h = H, minSupport = MinPairs).run(idx).take(10)
    def baselineOn(q: LakeGen.CorrQuery): Seq[Scored] =
      QcrBaseline.query(qcrIdx, q.keys, q.targets, k = 10, minSupport = MinPairs)

    // Warm-up.
    blendOn(d.nycIdx)(nyc.catQueries.head)

    val benches = Seq(
      ("NYC (All)", nyc.mixedQueries,
        "paper: BLEND 42/40 | BLEND(rand) 44/42 | Baseline 24/23; runtime base 0.56s vs BLEND 1.33s"),
      ("NYC (Cat.)", nyc.catQueries,
        "paper: BLEND 55/57 | BLEND(rand) 60/58 | Baseline 64/61; runtime base 0.67s vs BLEND 0.86s"),
    )

    val rows = benches.map { case (name, qs, paper) =>
      Row(name,
        evalSystem(qs, blendOn(d.nycIdx)),
        evalSystem(qs, blendOn(d.nycRandIdx)),
        evalSystem(qs, baselineOn),
        paper)
    }

    val tab = BenchUtil.table(
      Seq("Benchmark", "BLEND P/R@10", "BLEND(rand) P/R@10", "Baseline P/R@10",
        "BLEND s", "rand s", "Base s", "Paper (P@10/R@10 %)"),
      rows.map(r => Seq(r.bench,
        s"${BenchUtil.pct(r.blend.p)}/${BenchUtil.pct(r.blend.r)}",
        s"${BenchUtil.pct(r.blendRand.p)}/${BenchUtil.pct(r.blendRand.r)}",
        s"${BenchUtil.pct(r.baseline.p)}/${BenchUtil.pct(r.baseline.r)}",
        BenchUtil.sec(r.blend.ms), BenchUtil.sec(r.blendRand.ms), BenchUtil.sec(r.baseline.ms),
        r.paper)))
    Result(rows, BenchUtil.report("table7-correlation", tab))
  }
}
