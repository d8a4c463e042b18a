package repro.bench

/** Table VII harness: correlation discovery, BLEND / BLEND (rand) / QCR
  * sketch baseline.
  */
class BenchTable7Spec extends BenchSpec {

  private lazy val res = Table7Bench.run(spark)

  test("Table VII: both benchmarks are measured") {
    assert(res.rows.map(_.bench) == Seq("NYC (All)", "NYC (Cat.)"))
  }

  test("Table VII: BLEND beats the baseline on mixed-type keys (NYC All)") {
    val all = res.rows.find(_.bench == "NYC (All)").get
    assert(all.blend.p > all.baseline.p,
      s"baseline cannot handle numerical join keys: ${all.blend.p} !> ${all.baseline.p}")
  }

  test("Table VII: the baseline is competitive on categorical keys (NYC Cat.)") {
    val cat = res.rows.find(_.bench == "NYC (Cat.)").get
    assert(cat.baseline.p > 0.2, s"baseline should work on categorical keys: ${cat.baseline.p}")
    assert(cat.blend.p > 0.2, s"BLEND should work on categorical keys: ${cat.blend.p}")
  }

  test("Table VII: random sampling is at least as good as convenience sampling") {
    res.rows.foreach { r =>
      assert(r.blendRand.p >= r.blend.p - 0.05,
        s"${r.bench}: rand ${r.blendRand.p} vs vanilla ${r.blend.p}")
    }
    // Somewhere the sorted index must actually hurt, else the rand variant
    // would be pointless.
    assert(res.rows.exists(r => r.blendRand.p > r.blend.p),
      "expected the duplicate-heavy convenience sample to lose accuracy somewhere")
  }

  test("Table VII: every system answers within sane time") {
    res.rows.foreach { r =>
      Seq(r.blend.ms, r.blendRand.ms, r.baseline.ms).foreach(ms => assert(ms > 0 && ms < 60000))
    }
  }
}
