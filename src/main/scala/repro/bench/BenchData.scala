package repro.bench

import org.apache.spark.sql.SparkSession

import repro.core.AllTables
import repro.lake.LakeGen

/** The synthetic stand-ins for the paper's data lakes (Table II), built
  * lazily and shared across benches in one JVM. Sizes are 3–4 orders of
  * magnitude below the originals but keep the structure each experiment
  * needs (see DESIGN.md).
  */
final class BenchData(val spark: SparkSession) {

  // ------------------------------------------------- entity/join lakes
  /** GitTables stand-in: general mixed lake (Tables III, IV, VIII). Large
    * enough that seeker runtimes vary with query size, which the optimizer
    * experiments need.
    */
  lazy val gittables: LakeGen.MixedLake =
    LakeGen.mixedLake("gittables-lite", nEntities = 24000, nTables = 3000, rowsPerTable = 250, seed = 101)
  lazy val gittablesIdx: AllTables = AllTables.build(spark, gittables.lake.cellsDF(spark))

  /** DWTC stand-in (Table V). */
  lazy val dwtc: LakeGen.MixedLake =
    LakeGen.mixedLake("dwtc-lite", nEntities = 6000, nTables = 650, rowsPerTable = 50, seed = 102)
  lazy val dwtcIdx: AllTables = AllTables.build(spark, dwtc.lake.cellsDF(spark))

  /** German Open Data stand-in (Table V). */
  lazy val opendata: LakeGen.MixedLake =
    LakeGen.mixedLake("opendata-lite", nEntities = 1500, nTables = 250, rowsPerTable = 40, seed = 103)
  lazy val opendataIdx: AllTables = AllTables.build(spark, opendata.lake.cellsDF(spark))

  // ------------------------------------------------------- union lakes
  /** SANTOS stand-in: many mid-size unionable clusters, one family per
    * cluster (no cross-cluster semantic impostors — the regime where the
    * paper's Starmie shines) (Tables III, VI).
    */
  lazy val santos: LakeGen.UnionLake =
    LakeGen.unionLake("santos-lite", nClusters = 15, membersPerCluster = 22,
      rowsPerTable = 24, decoysPerCluster = 4, nFiller = 80, nFamilies = 15, seed = 111)
  lazy val santosIdx: AllTables = AllTables.build(spark, santos.lake.cellsDF(spark))

  /** TUS stand-in: few huge clusters, so ideal recall@10 is tiny; families
    * shared by two clusters (semantic impostors for Starmie) (Table VI).
    */
  lazy val tus: LakeGen.UnionLake =
    LakeGen.unionLake("tus-lite", nClusters = 6, membersPerCluster = 120,
      rowsPerTable = 24, decoysPerCluster = 20, nFiller = 120, nFamilies = 3, seed = 112)
  lazy val tusIdx: AllTables = AllTables.build(spark, tus.lake.cellsDF(spark))

  /** TUS Large stand-in; even denser family sharing (Table VI). */
  lazy val tusLarge: LakeGen.UnionLake =
    LakeGen.unionLake("tuslarge-lite", nClusters = 5, membersPerCluster = 160,
      rowsPerTable = 24, decoysPerCluster = 25, nFiller = 150, nFamilies = 2, seed = 113)
  lazy val tusLargeIdx: AllTables = AllTables.build(spark, tusLarge.lake.cellsDF(spark))

  // ------------------------------------------------- correlation lakes
  /** NYC Open Data stand-in (Tables III, VII). */
  lazy val nyc: LakeGen.CorrLake =
    LakeGen.corrLake("nyc-lite", nTables = 80, rowsPerTable = 260, keyUniverse = 500,
      nQueriesPerSplit = 20, seed = 121)
  lazy val nycIdx: AllTables = AllTables.build(spark, nyc.lake.cellsDF(spark))

  /** Apriori-shuffled variant of the NYC index — BLEND (rand) in Table VII. */
  lazy val nycRandIdx: AllTables =
    AllTables.build(spark, LakeGen.shuffleRows(nyc.lake, seed = 122).cellsDF(spark))
}

object BenchData {
  private var cached: Option[BenchData] = None
  def apply(spark: SparkSession): BenchData = synchronized {
    cached match {
      case Some(d) if d.spark eq spark => d
      case _ =>
        val d = new BenchData(spark)
        cached = Some(d)
        d
    }
  }
}
