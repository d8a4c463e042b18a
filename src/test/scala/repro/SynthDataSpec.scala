package repro

class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    val small = SynthData.lineitem(spark, sf = 0.001).count()
    val bigger = SynthData.lineitem(spark, sf = 0.002).count()
    assert(small == 6000L)
    assert(bigger == 12000L)
  }

  test("lineitem is deterministic in (sf, seed)") {
    def fingerprint = SynthData.lineitem(spark, 0.001, seed = 7)
      .select("l_orderkey", "l_partkey", "l_quantity", "l_returnflag")
      .collect().map(_.toString).sorted
    assert(fingerprint.sameElements(fingerprint))
    val a = fingerprint
    val b = fingerprint
    assert(a.sameElements(b))
  }

  test("orders keys are dense from 1") {
    val keys = SynthData.orders(spark, 0.001).select("o_orderkey")
      .collect().map(_.getLong(0))
    assert(keys.min == 1L && keys.max == keys.length.toLong)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val zipf = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(org.apache.spark.sql.functions.desc("count"))
      .limit(1).collect().head.getLong(1)
    val uni = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(org.apache.spark.sql.functions.desc("count"))
      .limit(1).collect().head.getLong(1)
    assert(zipf > uni * 3, s"zipf top key $zipf should dwarf uniform top key $uni")
  }

  test("customer market segments come from the fixed vocabulary") {
    val segs = SynthData.customer(spark, 0.001).select("c_mktsegment")
      .distinct().collect().map(_.getString(0)).toSet
    assert(segs.subsetOf(Set("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE")))
  }
}
