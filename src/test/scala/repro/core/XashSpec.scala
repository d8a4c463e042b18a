package repro.core

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite

class XashSpec extends AnyFunSuite {

  private def words(seed: Int, n: Int): Seq[String] = {
    val rnd = new Random(seed)
    Seq.fill(n)(rnd.alphanumeric.take(1 + rnd.nextInt(12)).mkString)
  }

  test("cellBits is deterministic") {
    assert(Xash.cellBits("hello") == Xash.cellBits("hello"))
  }

  test("cellBits sets between 1 and BitsPerValue bits") {
    words(1, 300).foreach { v =>
      val bits = java.lang.Long.bitCount(Xash.cellBits(v))
      assert(bits >= 1 && bits <= Xash.BitsPerValue, s"value $v -> $bits bits")
    }
  }

  test("superKey is the OR of cell bits") {
    val vs = words(2, 20)
    assert(Xash.superKey(vs) == vs.map(Xash.cellBits).reduce(_ | _))
  }

  test("superKey of empty collection is zero") {
    assert(Xash.superKey(Nil) == 0L)
  }

  test("no false negatives: a row always may-contain its own tuples") {
    val rnd = new Random(3)
    (0 until 100).foreach { i =>
      val tuple = words(100 + i, 1 + rnd.nextInt(3))
      val extra = words(200 + i, rnd.nextInt(8))
      val rowKey = Xash.superKey(tuple ++ extra)
      assert(Xash.mayContain(rowKey, Xash.tupleKey(tuple)))
    }
  }

  test("mayContain rejects keys with bits outside the row key") {
    val rowKey = Xash.superKey(Seq("alpha", "beta"))
    val foreign = Xash.tupleKey(Seq("some-very-unlikely-value-xyz-123"))
    assume((rowKey | foreign) != rowKey)
    assert(!Xash.mayContain(rowKey, foreign))
  }

  test("superKey is order-insensitive") {
    val vs = words(4, 15)
    assert(Xash.superKey(vs) == Xash.superKey(vs.reverse))
  }

  test("different values usually give different bit patterns") {
    val values = (0 until 500).map(i => s"value_$i")
    val distinctPatterns = values.map(Xash.cellBits).distinct
    assert(distinctPatterns.size > 450)
  }

  test("bloom filter has false positives but still prunes on dense rows") {
    val rowKey = Xash.superKey((0 until 12).map(i => s"cell_$i"))
    val probes = (0 until 2000).map(i => s"foreign_$i")
    val fpRate = probes.count(p => Xash.mayContain(rowKey, Xash.cellBits(p))).toDouble / probes.size
    assert(fpRate > 0.0, "expected some false positives on a dense row")
    assert(fpRate < 0.9, "bloom filter must still prune")
  }

  test("rotation distinguishes values of different lengths with same hash bits") {
    // Same content, different lengths -> almost surely different patterns.
    assert(Xash.cellBits("ab") != Xash.cellBits("ab "))
  }
}
