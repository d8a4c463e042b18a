package repro.bench

/** Table VIII harness: storage of BLEND's unified index vs. the sum of the
  * stand-alone indexes.
  */
class BenchTable8Spec extends BenchSpec {

  private lazy val res = Table8Bench.run(spark)

  test("Table VIII: all lakes are measured with nonzero sizes") {
    assert(res.rows.map(_.lake) == Seq("gittables-lite", "santos-lite", "nyc-lite"))
    res.rows.foreach { r =>
      Seq(r.blendBytes, r.dxfBytes, r.josieBytes, r.mateBytes, r.starmieBytes, r.qcrBytes)
        .foreach(b => assert(b > 0, s"${r.lake}: a component index is empty"))
    }
  }

  test("Table VIII: BLEND is smaller than the combination on every lake") {
    res.rows.foreach { r =>
      assert(r.blendBytes < r.combinationBytes,
        s"${r.lake}: ${r.blendBytes} !< ${r.combinationBytes}")
    }
  }

  test("Table VIII: average saving is substantial (paper: 57%)") {
    val avg = res.rows.map(_.saving).sum / res.rows.size
    assert(avg > 0.25, s"average saving $avg")
  }

  test("Table VIII: every lake saves storage, and at least one saves a third") {
    res.rows.foreach(r => assert(r.saving > 0.0, s"${r.lake}: no saving"))
    assert(res.rows.exists(_.saving > 0.33),
      s"expected a substantial per-lake saving: ${res.rows.map(r => r.lake -> r.saving)}")
  }
}
