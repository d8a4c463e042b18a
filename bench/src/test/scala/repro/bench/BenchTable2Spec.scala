package repro.bench

/** Table II harness: prints lake statistics next to the paper's corpora. */
class BenchTable2Spec extends BenchSpec {

  test("Table II: synthetic lakes are built and reported") {
    val res = Table2Bench.run(spark)
    assert(res.stats.size == 7)
    res.stats.foreach { s =>
      assert(s.tables > 0 && s.columns > 0 && s.rows > 0, s"${s.name} is empty")
    }
  }

  test("Table II: relative lake sizes mirror the paper's ordering") {
    val res = Table2Bench.run(spark)
    val byName = res.stats.map(s => s.name -> s).toMap
    // TUS Large has more tables than TUS; SANTOS is the smallest union lake.
    assert(byName("tuslarge-lite").tables > byName("tus-lite").tables)
    assert(byName("santos-lite").tables < byName("tus-lite").tables)
    // DWTC stand-in is the biggest entity lake, as DWTC is in the paper.
    assert(byName("dwtc-lite").rows > byName("opendata-lite").rows)
  }
}
