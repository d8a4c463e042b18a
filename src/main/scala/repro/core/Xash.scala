package repro.core

import scala.util.hashing.MurmurHash3

/** XASH-style super-key hashing (MATE, VLDB'22), simplified to 64 bits.
  *
  * Each cell value contributes a small number of pseudo-random bits; the
  * bit pattern is rotated by the value's length so that values of different
  * lengths rarely collide on the same positions. A row's *super key* is the
  * bitwise OR of its cells' patterns and acts as a bloom filter: a query
  * tuple can only join a row if every bit of the tuple's key is set in the
  * row's super key. False positives (bit collisions) are possible, false
  * negatives are not — exactly the property Table V of the paper measures.
  */
object Xash {

  /** Number of bits in a super key. MATE uses 128; 64 fits a Spark LongType
    * column and yields the false-positive rates the reproduction needs.
    */
  val Width: Int = 64

  /** Bits contributed by a single cell value. */
  val BitsPerValue: Int = 3

  /** Bit pattern of one cell value: `BitsPerValue` bits chosen by repeated
    * murmur hashing, rotated left by the value length (mod width).
    */
  def cellBits(value: String): Long = {
    var bits = 0L
    var i = 0
    while (i < BitsPerValue) {
      val h = MurmurHash3.stringHash(value, 0x9747b28c + i)
      bits |= 1L << ((h & 0x7fffffff) % Width)
      i += 1
    }
    java.lang.Long.rotateLeft(bits, value.length % Width)
  }

  /** Super key of a row = OR over its cell patterns. */
  def superKey(values: Iterable[String]): Long =
    values.foldLeft(0L)((acc, v) => acc | cellBits(v))

  /** Bloom-filter containment: can `tupleKey` (key of a query tuple) be
    * present in a row with super key `rowKey`?
    */
  def mayContain(rowKey: Long, tupleKey: Long): Boolean =
    (rowKey & tupleKey) == tupleKey

  /** Key of a query tuple (a projection of values that must co-occur). */
  def tupleKey(values: Iterable[String]): Long = superKey(values)
}
