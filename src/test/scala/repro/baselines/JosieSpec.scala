package repro.baselines

import repro.{Fixtures, SparkSpec}
import repro.core.ScSeeker

class JosieSpec extends SparkSpec {

  private lazy val idx = Josie.build(spark, Fixtures.fig1Lake)

  test("posting lists are distinct (value, table, column)") {
    assert(idx.df.count() == idx.df.distinct().count())
  }

  test("set sizes count distinct values per column") {
    // T1.Team has 3 distinct values.
    assert(idx.setSizes((0L, 0)) == 3)
    // T2.Year is constant -> one distinct value.
    assert(idx.setSizes((1L, 1)) == 1)
  }

  test("query agrees with BLEND's SC seeker on overlap sets") {
    val values = Seq("HR", "Marketing", "Finance", "IT", "R&D", "Sales")
    val josie = Josie.query(idx, values, k = -1)
    val blend = ScSeeker("sc", values).run(Fixtures.fig1Index)
    assert(josie == blend, "identical equi-join semantics must produce identical rankings")
  }

  test("query respects k") {
    val values = Seq("HR", "Marketing", "Finance")
    assert(Josie.query(idx, values, k = 1).size == 1)
  }

  test("duplicate query values do not inflate overlap") {
    val a = Josie.query(idx, Seq("HR", "HR", "Firenze"), k = -1)
    val b = Josie.query(idx, Seq("HR", "Firenze"), k = -1)
    assert(a == b)
  }

  test("unknown values return an empty result") {
    assert(Josie.query(idx, Seq("zzz-not-here"), k = 10).isEmpty)
  }
}
