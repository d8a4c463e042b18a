package repro.bench

/** Table VI harness: union-search quality, BLEND vs the Starmie substitute. */
class BenchTable6Spec extends BenchSpec {

  private lazy val res = Table6Bench.run(spark)

  test("Table VI: all lake/k combinations are measured") {
    val keys = res.rows.map(r => (r.lake, r.k))
    assert(keys.contains(("SANTOS", 10)) && keys.contains(("SANTOS", 20)))
    assert(keys.contains(("TUS", 50)) && keys.contains(("TUS Large", 100)))
  }

  test("Table VI: metrics are valid probabilities") {
    res.rows.foreach { r =>
      Seq(r.blend.p, r.blend.recall, r.blend.map, r.starmie.p, r.starmie.recall, r.starmie.map)
        .foreach(v => assert(v >= 0.0 && v <= 1.0))
    }
  }

  test("Table VI: recall@10 on the TUS lakes is tiny (huge ground-truth sets)") {
    val tus10 = res.rows.find(r => r.lake == "TUS" && r.k == 10).get
    assert(tus10.blend.recall < 0.2, "cluster sizes >= 100 cap recall@10")
  }

  test("Table VI: BLEND overtakes Starmie at large k (semantic decoys hurt Starmie)") {
    val large = res.rows.filter(r => r.k >= 50)
    assert(large.nonEmpty)
    val blendWins = large.count(r => r.blend.p >= r.starmie.p)
    assert(blendWins >= large.size - 1,
      s"BLEND should win at large k: ${large.map(r => (r.lake, r.k, r.blend.p, r.starmie.p))}")
  }

  test("Table VI: both systems find real cluster members at k=10") {
    val k10 = res.rows.filter(_.k == 10)
    k10.foreach { r =>
      assert(r.blend.p > 0.3, s"${r.lake}: BLEND P@10 ${r.blend.p}")
      assert(r.starmie.p > 0.3, s"${r.lake}: Starmie P@10 ${r.starmie.p}")
    }
  }
}
