package repro.bench

/** Table III harness: complex discovery tasks, BLEND vs B-NO vs federated
  * baselines (runtime, LOC, #systems, #indexes).
  */
class BenchTable3Spec extends BenchSpec {

  private lazy val res = Table3Bench.run(spark)

  test("Table III: all four complex tasks produce measurements") {
    assert(res.rows.map(_.task) ==
      Seq("Negative Examples", "Data Imputation", "Feature Discovery", "Multi-Objective"))
    res.rows.foreach { r =>
      assert(r.blendMs > 0 && r.bnoMs > 0 && r.baselineMs > 0, s"${r.task}: missing runtimes")
    }
  }

  test("Table III: BLEND needs an order of magnitude less code than the federation") {
    res.rows.foreach { r =>
      assert(r.blendLoc < r.baselineLoc, s"${r.task}: LOC ${r.blendLoc} !< ${r.baselineLoc}")
      assert(r.blendLoc <= 10, s"${r.task}: BLEND plans are a few lines")
    }
  }

  test("Table III: BLEND is never slower than B-NO beyond noise (optimizer helps)") {
    res.rows.foreach { r =>
      assert(r.blendMs <= r.bnoMs * 1.25,
        s"${r.task}: BLEND ${r.blendMs}ms vs B-NO ${r.bnoMs}ms")
    }
  }

  test("Table III: multi-objective runtimes of BLEND and B-NO are close (union sub-plans)") {
    val mo = res.rows.find(_.task == "Multi-Objective").get
    val ratio = mo.blendMs / mo.bnoMs
    assert(ratio > 0.6 && ratio < 1.4, s"expected near-equal runtimes, ratio $ratio")
  }
}
