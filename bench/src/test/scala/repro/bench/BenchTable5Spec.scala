package repro.bench

/** Table V harness: MC join precision, BLEND vs MATE. */
class BenchTable5Spec extends BenchSpec {

  private lazy val res = Table5Bench.run(spark)

  test("Table V: both lakes are measured") {
    assert(res.rows.map(_.lake) == Seq("DWTC-lite", "OpenData-lite"))
  }

  test("Table V: recall parity — identical TP counts for BLEND and MATE") {
    res.rows.foreach { r =>
      assert(math.abs(r.blendTp - r.mateTp) < 1e-9,
        s"${r.lake}: TP ${r.blendTp} vs ${r.mateTp} (bloom filters admit no false negatives)")
    }
  }

  test("Table V: BLEND precision beats MATE precision on every lake") {
    res.rows.foreach { r =>
      assert(r.blendPrecision > r.matePrecision,
        s"${r.lake}: ${r.blendPrecision} !> ${r.matePrecision}")
    }
  }

  test("Table V: BLEND precision is near-perfect, MATE fetches far more candidates") {
    res.rows.foreach { r =>
      assert(r.blendPrecision > 0.9, s"${r.lake}: BLEND precision ${r.blendPrecision}")
      assert(r.mateFp > r.blendFp, s"${r.lake}: MATE FP ${r.mateFp} vs BLEND FP ${r.blendFp}")
    }
  }
}
