package repro.baselines

import repro.{Fixtures, SparkSpec}
import repro.core.McSeeker

class MateSpec extends SparkSpec {

  private lazy val fig1Idx = Mate.build(spark, Fixtures.fig1Lake)
  private lazy val mixedIdx = Mate.build(spark, Fixtures.mixed.lake)

  test("finds tables containing the (HR, Firenze) projection") {
    val res = Mate.query(fig1Idx, Fixtures.fig1Lake, Seq(Vector("HR", "Firenze")), k = 10)
    assert(res.ranking.map(_.tableId).toSet == Set(1L, 2L))
  }

  test("validation rejects rows without the full tuple") {
    // "Marketing" and "Tom Riddle" never co-occur in a row.
    val res = Mate.query(fig1Idx, Fixtures.fig1Lake, Seq(Vector("Marketing", "Tom Riddle")), k = 10)
    assert(res.ranking.isEmpty)
    assert(res.tp == 0)
  }

  test("recall matches BLEND's MC seeker (bloom filters have no false negatives)") {
    val tuples = Fixtures.mixed.universe.take(20).map(_.pair)
    val mate = Mate.query(mixedIdx, Fixtures.mixed.lake, tuples, k = -1)
    val blend = McSeeker("mc", tuples).runDetailed(Fixtures.mixedIndex)
    assert(mate.ranking.map(_.tableId).toSet == blend.ranking.map(_.tableId).toSet)
    assert(mate.tp == blend.tp, "true-positive row counts must agree")
  }

  test("MATE fetches at least as many candidates as BLEND (coarser pruning)") {
    val tuples = Fixtures.mixed.universe.take(20).map(_.pair)
    val mate = Mate.query(mixedIdx, Fixtures.mixed.lake, tuples, k = -1)
    val blend = McSeeker("mc", tuples).runDetailed(Fixtures.mixedIndex)
    assert(mate.fetched >= blend.fetched,
      s"MATE prunes on one column + bloom only (${mate.fetched} vs ${blend.fetched})")
  }

  test("fetched = tp + fp") {
    val tuples = Fixtures.mixed.universe.take(15).map(_.pair)
    val res = Mate.query(mixedIdx, Fixtures.mixed.lake, tuples, k = -1)
    assert(res.fetched == res.tp + res.fp)
  }

  test("precision on the mixed lake is below 100% (bloom false positives)") {
    val tuples = Fixtures.mixed.universe.take(40).map(_.pair)
    val res = Mate.query(mixedIdx, Fixtures.mixed.lake, tuples, k = -1)
    assert(res.fp > 0, "shared city values + dense super keys should produce FPs")
  }

  test("k truncates the ranking") {
    val tuples = Fixtures.mixed.universe.take(20).map(_.pair)
    assert(Mate.query(mixedIdx, Fixtures.mixed.lake, tuples, k = 3).ranking.size <= 3)
  }
}
