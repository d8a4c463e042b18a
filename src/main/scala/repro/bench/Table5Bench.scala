package repro.bench

import scala.util.Random

import org.apache.spark.sql.SparkSession

import repro.baselines.Mate
import repro.core.McSeeker

/** Table V — multi-column join discovery precision: BLEND's MC seeker vs.
  * MATE. Candidates are counted after each system's last pruning step
  * (BLEND: value co-occurrence SQL + super-key filter; MATE: first-column
  * posting + super-key filter), then validated exactly. Recall is 100% for
  * both by bloom-filter construction, so the table reports TP, FP and
  * precision, plus runtime.
  */
object Table5Bench {

  final case class Row(
      lake: String,
      blendTp: Double, blendFp: Double, blendPrecision: Double, blendMs: Double,
      mateTp: Double, mateFp: Double, matePrecision: Double, mateMs: Double,
      paper: String,
  )

  final case class Result(rows: Seq[Row], report: String)

  def run(spark: SparkSession, queriesPerLake: Int = 25): Result = {
    val d = BenchData(spark)
    val rnd = new Random(55)

    val lakes = Seq(
      ("DWTC-lite", d.dwtc, d.dwtcIdx,
        "paper: BLEND TP 21,228 FP 3 P 99.99% | MATE TP 21,228 FP 7,953 P 73%; BLEND 2.6x faster"),
      ("OpenData-lite", d.opendata, d.opendataIdx,
        "paper: BLEND TP 5,563 FP 14 P 99.7% | MATE TP 5,563 FP 3,587 P 61%; BLEND 10x faster"),
    )

    val rows = lakes.map { case (name, mixed, idx, paper) =>
      val mateIdx = Mate.build(spark, mixed.lake)

      var bTp = 0L; var bFp = 0L; var bMs = 0.0
      var mTp = 0L; var mFp = 0L; var mMs = 0.0
      (0 until queriesPerLake).foreach { _ =>
        val n = 20 + rnd.nextInt(40)
        val start = rnd.nextInt(math.max(1, mixed.universe.size - n))
        val tuples = mixed.universe.slice(start, start + n).map(_.pair)

        val (bDet, bt) = BenchUtil.time(McSeeker("mc", tuples).runDetailed(idx))
        val (mRes, mt) = BenchUtil.time(Mate.query(mateIdx, mixed.lake, tuples, k = -1))
        bTp += bDet.tp; bFp += bDet.fp; bMs += bt
        mTp += mRes.tp; mFp += mRes.fp; mMs += mt
      }
      val n = queriesPerLake.toDouble
      Row(name,
        bTp / n, bFp / n, bTp.toDouble / math.max(1, bTp + bFp), bMs / n,
        mTp / n, mFp / n, mTp.toDouble / math.max(1, mTp + mFp), mMs / n,
        paper)
    }

    val tab = BenchUtil.table(
      Seq("Lake", "BLEND TP", "BLEND FP", "BLEND P", "BLEND s",
        "MATE TP", "MATE FP", "MATE P", "MATE s", "Paper"),
      rows.map(r => Seq(r.lake,
        f"${r.blendTp}%.0f", f"${r.blendFp}%.1f", BenchUtil.pct(r.blendPrecision), BenchUtil.sec(r.blendMs),
        f"${r.mateTp}%.0f", f"${r.mateFp}%.1f", BenchUtil.pct(r.matePrecision), BenchUtil.sec(r.mateMs),
        r.paper)))
    Result(rows, BenchUtil.report("table5-multicolumn", tab))
  }
}
