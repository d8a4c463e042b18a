package repro

import org.apache.spark.sql.SparkSession

import repro.core.AllTables
import repro.lake.{Lake, LakeColumn, LakeGen, LakeTable}

/** Shared test data. Everything is lazy and lives for the whole forked test
  * JVM, so expensive index builds happen once per run.
  */
object Fixtures {

  lazy val spark: SparkSession = SparkSpec.shared

  /** The running example of the paper (Fig. 1): lake tables T1 (id 0),
    * T2 (id 1), T3 (id 2). T2 is "outdated" (contains IT/Tom Riddle),
    * T3 is the intended answer of Example 1.
    */
  lazy val fig1Lake: Lake = {
    val t1 = LakeTable(0, "T1", Vector(
      LakeColumn("Team", Vector("Finance", "Marketing", "HR")),
      LakeColumn("Size", Vector("31", "28", "33"), Some(Vector(31, 28, 33))),
    ))
    val t2 = LakeTable(1, "T2", Vector(
      LakeColumn("Lead", Vector("Tom Riddle", "Draco Malfoy", "Harry Potter", "Cho Chang", "Luna Lovegood", "Firenze")),
      LakeColumn("Year", Vector.fill(6)("2022"), Some(Vector.fill(6)(2022.0))),
      LakeColumn("Team", Vector("IT", "Marketing", "Finance", "R&D", "Sales", "HR")),
    ))
    val t3 = LakeTable(2, "T3", Vector(
      LakeColumn("Lead", Vector("Ronald Weasley", "Draco Malfoy", "Harry Potter", "Firenze")),
      LakeColumn("Year", Vector.fill(4)("2024"), Some(Vector.fill(4)(2024.0))),
      LakeColumn("Team", Vector("IT", "Marketing", "Finance", "HR")),
    ))
    Lake("fig1", Vector(t1, t2, t3))
  }

  lazy val fig1Index: AllTables = AllTables.build(spark, fig1Lake.cellsDF(spark))

  lazy val mixed: LakeGen.MixedLake =
    LakeGen.mixedLake("mixed-test", nEntities = 400, nTables = 60, rowsPerTable = 20, seed = 5)
  lazy val mixedIndex: AllTables = AllTables.build(spark, mixed.lake.cellsDF(spark))

  lazy val union: LakeGen.UnionLake =
    LakeGen.unionLake("union-test", nClusters = 6, membersPerCluster = 6,
      rowsPerTable = 16, decoysPerCluster = 2, nFiller = 10, seed = 21)
  lazy val unionIndex: AllTables = AllTables.build(spark, union.lake.cellsDF(spark))

  lazy val corr: LakeGen.CorrLake =
    LakeGen.corrLake("corr-test", nTables = 16, rowsPerTable = 80, keyUniverse = 80,
      nQueriesPerSplit = 4, seed = 31)
  lazy val corrIndex: AllTables = AllTables.build(spark, corr.lake.cellsDF(spark))

  /** Quote a value list for hand-written DuckDB oracle SQL. */
  def sqlList(values: Seq[String]): String =
    values.map(v => s"'${v.replace("'", "''")}'").mkString(", ")
}
