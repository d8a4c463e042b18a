package repro.bench

/** Table IV harness: optimizer effectiveness (Rand / BLEND / Ideal runtime,
  * gains, ordering accuracy).
  */
class BenchTable4Spec extends BenchSpec {

  private lazy val res = Table4Bench.run(spark)

  test("Table IV: all four seeker rows are measured") {
    assert(res.rows.map(_.seeker) == Seq("Mixed", "SC", "MC", "C"))
  }

  test("Table IV: Ideal <= BLEND-without-overhead and Ideal <= Rand") {
    res.rows.foreach { r =>
      assert(r.idealMs <= r.randMs + 1e-6, s"${r.seeker}: ideal must not exceed rand")
      // BLEND includes optimization overhead, so compare against rand only.
      assert(r.blendMs <= r.randMs * 1.2, s"${r.seeker}: BLEND ${r.blendMs} vs Rand ${r.randMs}")
    }
  }

  test("Table IV: optimizer accuracy is meaningfully better than a coin flip") {
    res.rows.foreach { r =>
      assert(r.accuracy >= 0.5, s"${r.seeker}: accuracy ${r.accuracy}")
    }
    // At least one same-type row (driven by the learned cost model alone)
    // must be clearly better than random.
    val learned = res.rows.filter(r => r.seeker != "Mixed")
    assert(learned.exists(_.accuracy >= 0.6),
      s"cost model should beat random ordering: ${learned.map(r => r.seeker -> r.accuracy)}")
  }

  test("Table IV: cost-model training completes in reasonable time") {
    assert(res.trainMs > 0)
    assert(res.trainMs < 10 * 60 * 1000, "training must not dominate the bench")
  }
}
