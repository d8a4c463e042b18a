package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import repro.Fixtures

class StarmieSpec extends AnyFunSuite {

  private lazy val union = Fixtures.union
  private lazy val idx = StarmieLike.build(union.lake)

  test("embedding is deterministic and L2-normalized") {
    val a = StarmieLike.embedColumn(Seq("f1_d2_v1", "f1_d2_v2"))
    val b = StarmieLike.embedColumn(Seq("f1_d2_v1", "f1_d2_v2"))
    assert(a.sameElements(b))
    assert(math.abs(a.map(x => x * x).sum - 1.0) < 1e-9)
  }

  test("embedding ignores value order and duplicates") {
    val a = StarmieLike.embedColumn(Seq("f1_d2_v1", "f1_d2_v2", "f1_d2_v2"))
    val b = StarmieLike.embedColumn(Seq("f1_d2_v2", "f1_d2_v1"))
    assert(a.sameElements(b))
  }

  test("same-family columns are closer than cross-family columns") {
    val a = StarmieLike.embedColumn((0 until 10).map(i => s"f1_d0_a$i"))
    val sameFam = StarmieLike.embedColumn((0 until 10).map(i => s"f1_d3_b$i"))
    val otherFam = StarmieLike.embedColumn((0 until 10).map(i => s"f2_d0_c$i"))
    def cos(x: Array[Double], y: Array[Double]) = x.zip(y).map { case (p, q) => p * q }.sum
    assert(cos(a, sameFam) > cos(a, otherFam))
  }

  test("index embeds only non-numeric columns") {
    val t = union.lake.tables.head
    val nonNumeric = t.columns.count(!_.isNumeric)
    assert(idx.tables.find(_._1 == t.id).get._2.length == nonNumeric)
  }

  test("query ranks true cluster members above filler tables") {
    val q = union.queries.head
    val truth = union.lake.unionGroundTruth(q)
    val ranking = StarmieLike.queryTable(idx, union.lake.table(q), k = -1)
    val fillerIds = union.lake.tables.filter(_.name.contains("filler")).map(_.id).toSet
    val firstFiller = ranking.indexWhere(s => fillerIds.contains(s.tableId))
    val memberRanks = ranking.zipWithIndex.collect { case (s, i) if truth.contains(s.tableId) => i }
    assert(memberRanks.take(3).forall(_ < firstFiller),
      "top cluster members must outrank unrelated filler")
  }

  test("semantic reach: finds low-overlap members that value overlap misses") {
    val q = union.queries.head
    val truth = union.lake.unionGroundTruth(q)
    val top = StarmieLike.queryTable(idx, union.lake.table(q), k = truth.size).map(_.tableId).toSet
    assert((top intersect truth).nonEmpty)
  }

  test("decoys pollute the ranking (semantic false positives)") {
    val q = union.queries.head
    val decoyIds = union.lake.tables.filter(_.name.contains("decoy")).map(_.id).toSet
    val top30 = StarmieLike.queryTable(idx, union.lake.table(q), k = 30).map(_.tableId)
    assert(top30.exists(decoyIds.contains), "same-family decoys should rank high for Starmie")
  }
}
