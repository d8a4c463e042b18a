package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench._
import repro.core.{AllTables, BlendSession}

/** Shared session bootstrap for the spark-submit entrypoints. */
object JobSession {
  def create(name: String): SparkSession = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"))
      .config("spark.sql.adaptive.enabled", "false")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    BlendSession.install(spark)
    spark
  }
}

/** Offline phase (Fig. 2e): build the unified index for a lake and persist
  * it as parquet. Usage: `spark-submit ... repro.jobs.BuildIndexJob <outDir>`.
  */
object BuildIndexJob {
  def main(args: Array[String]): Unit = {
    val out = args.headOption.getOrElse("target/alltables")
    val spark = JobSession.create("blend-build-index")
    try {
      val idx = BenchData(spark).gittablesIdx
      AllTables.save(idx, out)
      println(s"AllTables written to $out (${idx.nCells} cells)")
    } finally spark.stop()
  }
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-table2")
    try Table2Bench.run(spark) finally spark.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-table3")
    try Table3Bench.run(spark) finally spark.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-table4")
    try Table4Bench.run(spark) finally spark.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-table5")
    try Table5Bench.run(spark) finally spark.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-table6")
    try Table6Bench.run(spark) finally spark.stop()
  }
}

object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-table7")
    try Table7Bench.run(spark) finally spark.stop()
  }
}

object Table8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-table8")
    try Table8Bench.run(spark) finally spark.stop()
  }
}

object Table9Job {
  def main(args: Array[String]): Unit = {
    Table9Bench.run()
    ()
  }
}

/** Runs every table bench in sequence — the full evaluation section. */
object AllTablesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("blend-all-benches")
    try {
      Table2Bench.run(spark)
      Table3Bench.run(spark)
      Table4Bench.run(spark)
      Table5Bench.run(spark)
      Table6Bench.run(spark)
      Table7Bench.run(spark)
      Table8Bench.run(spark)
      Table9Bench.run()
    } finally spark.stop()
  }
}
