package repro

import org.apache.spark.sql.functions._

/** The oracle itself must be trustworthy: it accepts matching results and
  * rejects mismatches on rows, values and column sets.
  */
class OracleSpec extends SparkSpec {

  import spark.implicits._

  private def df = Seq(("a", 1L), ("b", 2L), ("a", 3L)).toDF("k", "v")

  test("accepts an equivalent aggregation") {
    val got = df.groupBy("k").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
  }

  test("rejects a wrong aggregate") {
    val got = df.groupBy("k").agg(count(lit(1)).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT k, COUNT(*) + 1 AS n FROM t GROUP BY k", "t" -> df)
    }
  }

  test("rejects missing rows") {
    val got = df.where($"k" === "a").groupBy("k").agg(count(lit(1)).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
    }
  }

  test("rejects mismatching column sets") {
    val got = df.groupBy("k").agg(count(lit(1)).as("wrong_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
    }
  }

  test("canonicalizes doubles across engines") {
    val got = df.groupBy("k").agg(avg("v").as("m"))
    Oracle.assertEquivalent(got,
      "SELECT k, AVG(CAST(v AS DOUBLE)) AS m FROM t GROUP BY k", "t" -> df)
  }

  test("handles null cells") {
    val withNull = Seq(("a", Option(1L)), ("b", None)).toDF("k", "v")
    Oracle.assertEquivalent(withNull.select("k", "v"),
      "SELECT k, v FROM t", "t" -> withNull)
  }
}
