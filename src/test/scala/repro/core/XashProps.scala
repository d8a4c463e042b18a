package repro.core

import org.scalacheck.{Gen, Prop, Properties}

/** Property-based checks of the XASH hash, run by the native ScalaCheck
  * framework under sbt test.
  */
object XashProps extends Properties("Xash") {

  private val word: Gen[String] =
    Gen.nonEmptyListOf(Gen.alphaNumChar).map(_.mkString)

  property("bitCount bounded") = Prop.forAll(word) { v =>
    val n = java.lang.Long.bitCount(Xash.cellBits(v))
    n >= 1 && n <= Xash.BitsPerValue
  }

  property("superKey absorbs supersets") = Prop.forAll(Gen.nonEmptyListOf(word), Gen.listOf(word)) {
    (tuple, extra) =>
      Xash.mayContain(Xash.superKey(tuple ++ extra), Xash.tupleKey(tuple))
  }

  property("superKey associative accumulation") = Prop.forAll(Gen.nonEmptyListOf(word)) { vs =>
    Xash.superKey(vs) == vs.foldLeft(0L)((a, v) => a | Xash.cellBits(v))
  }

  property("mayContain monotone under OR") = Prop.forAll(word, word) { (a, b) =>
    val k = Xash.cellBits(a)
    Xash.mayContain(k | Xash.cellBits(b), k)
  }
}
