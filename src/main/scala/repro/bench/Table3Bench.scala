package repro.bench

import java.nio.file.Files

import scala.util.Random

import org.apache.spark.sql.SparkSession

import repro.baselines._
import repro.core._
import repro.lake.LakeGen
import repro.tasks.Tasks
import repro.util.Loc

/** Table III — complex discovery tasks: runtime, LOC, number of systems and
  * indexes for BLEND, B-NO (no optimizer) and the federated baseline.
  *
  * Workloads (see DESIGN.md): negative examples, imputation and
  * multi-objective discovery run on gittables-lite; feature discovery runs
  * on nyc-lite (it needs planted correlations).
  *
  * Accounting: BLEND runs inside the warm "database" (the cached AllTables
  * index). The federated baselines are stand-alone tools, so each task
  * invocation pays the cold start of every involved system — loading its
  * index state from its own on-disk store — before querying. This is the
  * "time-consuming data loading between the database and memory" the paper
  * names as the federation's cost (§VIII-B5); the index *builds* are
  * offline and untimed for everyone.
  */
object Table3Bench {

  final case class TaskRow(
      task: String,
      blendMs: Double, bnoMs: Double, baselineMs: Double,
      blendLoc: Int, baselineLoc: Int,
      baselineSystems: Int,
      paper: String,
  )

  final case class Result(rows: Seq[TaskRow], report: String)

  def run(spark: SparkSession): Result = {
    val d = BenchData(spark)
    val rnd = new Random(77)

    val g = d.gittables
    val gIdx = d.gittablesIdx
    val nyc = d.nyc
    val nycIdx = d.nycIdx

    // Offline (untimed): every system serializes its index to disk.
    val store = Files.createTempDirectory("fed-store")
    Mate.save(Mate.build(spark, g.lake), store.resolve("mate-g").toString)
    Josie.save(Josie.build(spark, g.lake), store.resolve("josie-g").toString)
    val starmiePath = store.resolve("starmie-g.bin")
    StarmieLike.save(StarmieLike.build(g.lake), starmiePath)
    val qcrGPath = store.resolve("qcr-g.bin")
    QcrBaseline.save(QcrBaseline.build(g.lake, h = 64), qcrGPath)
    Mate.save(Mate.build(spark, nyc.lake), store.resolve("mate-nyc").toString)
    val qcrNycPath = store.resolve("qcr-nyc.bin")
    QcrBaseline.save(QcrBaseline.build(nyc.lake, h = 64), qcrNycPath)

    val blendG = new Executor(spark, gIdx, CostModel.untrained, optimize = true)
    val bnoG = new Executor(spark, gIdx, CostModel.untrained, optimize = false)
    val blendNyc = new Executor(spark, nycIdx, CostModel.untrained, optimize = true)
    val bnoNyc = new Executor(spark, nycIdx, CostModel.untrained, optimize = false)

    def window(region: Int, n: Int): Seq[Int] = {
      val half = g.universe.size / 2
      val base = if (region == 0) 0 else half
      val start = base + rnd.nextInt(math.max(1, half - n))
      start until math.min(start + n, base + half)
    }
    def pairsOf(idxs: Seq[Int]): Seq[Vector[String]] = idxs.map(i => g.universe(i).pair)

    /** Mean runtime per variant, interleaving (rotating) the order of
      * variants per query and running one untimed warm-up of each — so JIT
      * warm-up and cache drift do not bias one variant.
      */
    def measure3[Q](queries: Seq[Q], variants: Seq[Q => Any]): Seq[Double] = {
      variants.foreach(v => v(queries.head))
      val sums = Array.fill(variants.size)(0.0)
      for ((q, i) <- queries.zipWithIndex; j <- variants.indices) {
        val v = (i + j) % variants.size
        sums(v) += BenchUtil.time(variants(v)(q))._2
      }
      sums.map(_ / queries.size).toSeq
    }

    // ---------------------------------------------- 1. negative examples
    // Negatives are sampled from (most of) the tables that contain the
    // positives — "outdated versions" of the wanted tables, as in the
    // paper's SANTOS workload. This is what gives the NOT-IN rewriting its
    // pruning power.
    val negQueries = Seq.fill(8) {
      val pos = window(0, 250)
      val posSet = pos.toSet
      val posTables = g.tableEntities.zipWithIndex.collect {
        case (es, t) if es.exists(posSet.contains) => t
      }
      val outdated = rnd.shuffle(posTables).take(math.max(1, posTables.size * 3 / 5))
      val negPool = outdated.flatMap(t => g.tableEntities(t)).distinct.filterNot(posSet.contains)
      val neg = rnd.shuffle(negPool).take(300)
      (pairsOf(pos), pairsOf(neg))
    }
    val Seq(negBlendMs, negBnoMs, negBaseMs) = measure3[(Seq[Vector[String]], Seq[Vector[String]])](
      negQueries,
      Seq(
        { case (pos, neg) => blendG.execute(Tasks.negativeExamplesPlan(pos, neg, 10)) },
        { case (pos, neg) => bnoG.execute(Tasks.negativeExamplesPlan(pos, neg, 10)) },
        { case (pos, neg) =>
          val mate = Mate.load(spark, store.resolve("mate-g").toString) // cold start
          Federation.negativeExamples(spark, mate, g.lake, pos, neg, 10)
        },
      ))

    // --------------------------------------------------- 2. imputation
    val impQueries = Seq.fill(10) {
      val es = window(rnd.nextInt(2), 40)
      (pairsOf(es.take(5)), es.drop(5).map(g.universe(_).person))
    }
    val Seq(impBlendMs, impBnoMs, impBaseMs) = measure3[(Seq[Vector[String]], Seq[String])](
      impQueries,
      Seq(
        { case (ex, q) => blendG.execute(Tasks.imputationPlan(ex, q, 10)) },
        { case (ex, q) => bnoG.execute(Tasks.imputationPlan(ex, q, 10)) },
        { case (ex, q) =>
          val mate = Mate.load(spark, store.resolve("mate-g").toString)    // cold start
          val josie = Josie.load(spark, store.resolve("josie-g").toString) // cold start
          Federation.imputation(spark, mate, josie, g.lake, ex, q, 10)
        },
      ))

    // --------------------------------------------- 3. feature discovery
    def joinTuplesOf(q: LakeGen.CorrQuery): Seq[Vector[String]] =
      q.keys.map { k =>
        val i = k.replaceAll("[^0-9]", "").toInt
        Vector(k, s"lbl_${i % 17}")
      }
    val featQueries = d.nyc.catQueries.take(6).zipWithIndex.map { case (q, i) =>
      val feats = Seq(nyc.catQueries((i + 7) % nyc.catQueries.size), nyc.catQueries((i + 13) % nyc.catQueries.size))
        .map(f => (f.keys: Seq[String], f.targets: Seq[Double]))
      (q, feats)
    }
    val Seq(featBlendMs, featBnoMs, featBaseMs) =
      measure3[(LakeGen.CorrQuery, Seq[(Seq[String], Seq[Double])])](
        featQueries,
        Seq(
          { case (q, feats) => blendNyc.execute(
            Tasks.featureDiscoveryPlan(q.keys, q.targets, feats, joinTuplesOf(q).take(40), 64, 10)) },
          { case (q, feats) => bnoNyc.execute(
            Tasks.featureDiscoveryPlan(q.keys, q.targets, feats, joinTuplesOf(q).take(40), 64, 10)) },
          { case (q, feats) =>
            val qcr = QcrBaseline.load(qcrNycPath)                          // cold start
            val mate = Mate.load(spark, store.resolve("mate-nyc").toString) // cold start
            Federation.featureDiscovery(spark, qcr, mate, nyc.lake,
              q.keys, q.targets, feats, joinTuplesOf(q).take(40), 10)
          },
        ))

    // ------------------------------------------ 4. multi-objective
    val moQueries = Seq.fill(8) {
      val es = window(rnd.nextInt(2), 35).map(g.universe)
      val keywords = es.take(5).map(_.person)
      val cols = Seq(es.map(_.person), es.map(_.city), es.map(_.dept))
      (keywords, cols, es.map(_.person), es.map(_.score))
    }
    val Seq(moBlendMs, moBnoMs, moBaseMs) =
      measure3[(Seq[String], Seq[Seq[String]], Seq[String], Seq[Double])](
        moQueries,
        Seq(
          { case (kw, cols, ck, ct) => blendG.execute(Tasks.multiObjectivePlan(kw, cols, ck, ct, 64, 40)) },
          { case (kw, cols, ck, ct) => bnoG.execute(Tasks.multiObjectivePlan(kw, cols, ck, ct, 64, 40)) },
          { case (kw, cols, ck, ct) =>
            val josie = Josie.load(spark, store.resolve("josie-g").toString) // cold start
            val starmie = StarmieLike.load(starmiePath)                      // cold start
            val qcr = QcrBaseline.load(qcrGPath)                             // cold start
            Federation.multiObjective(spark, josie, starmie, qcr, g.lake, kw, cols, ck, ct, 40)
          },
        ))

    val rows = Seq(
      TaskRow("Negative Examples", negBlendMs, negBnoMs, negBaseMs,
        Loc.count("blend-negatives"), Loc.count("fed-negatives"), 1,
        "paper runtime(s): BLEND 14.2 | B-NO 111.9 | Base 30.5; LOC 5 vs 72; systems 1"),
      TaskRow("Data Imputation", impBlendMs, impBnoMs, impBaseMs,
        Loc.count("blend-imputation"), Loc.count("fed-imputation"), 2,
        "paper runtime(s): BLEND 0.19 | B-NO 0.26 | Base 0.67; LOC 5 vs 51; systems 2"),
      TaskRow("Feature Discovery", featBlendMs, featBnoMs, featBaseMs,
        Loc.count("blend-features"), Loc.count("fed-features"), 2,
        "paper runtime(s): BLEND 9.0 | B-NO 16.3 | Base 22.8; LOC 7 vs 49; systems 2"),
      TaskRow("Multi-Objective", moBlendMs, moBnoMs, moBaseMs,
        Loc.count("blend-multiobjective"), Loc.count("fed-multiobjective"), 3,
        "paper runtime(s): BLEND 5.5 | B-NO 5.5 | Base 47.0; LOC 8 vs 135; systems 3"),
    )

    val tab = BenchUtil.table(
      Seq("Task", "BLEND s", "B-NO s", "Baseline s", "LOC B/Base", "#Sys B/Base", "#Idx B/Base", "Paper"),
      rows.map(r => Seq(
        r.task, BenchUtil.sec(r.blendMs), BenchUtil.sec(r.bnoMs), BenchUtil.sec(r.baselineMs),
        s"${r.blendLoc}/${r.baselineLoc}", s"1/${r.baselineSystems}",
        s"Single/Multi", r.paper)))
    Result(rows, BenchUtil.report("table3-complex-tasks", tab))
  }
}
