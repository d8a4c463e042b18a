package repro.core

import org.scalatest.funsuite.AnyFunSuite

class CombinersSpec extends AnyFunSuite {

  private def s(pairs: (Long, Double)*): Seq[Scored] = pairs.map { case (t, v) => Scored(t, v) }

  test("intersection keeps only common tables and sums scores") {
    val out = Combiner.Intersection(Seq(s(1L -> 2.0, 2L -> 1.0), s(2L -> 3.0, 3L -> 9.0)))
    assert(out == Seq(Scored(2, 4.0)))
  }

  test("intersection of three inputs") {
    val out = Combiner.Intersection(Seq(s(1L -> 1.0, 2L -> 1.0), s(1L -> 1.0, 2L -> 1.0), s(2L -> 1.0)))
    assert(out.map(_.tableId) == Seq(2L))
  }

  test("intersection requires at least two inputs") {
    intercept[IllegalArgumentException](Combiner.Intersection(Seq(s(1L -> 1.0))))
  }

  test("intersection can be empty") {
    assert(Combiner.Intersection(Seq(s(1L -> 1.0), s(2L -> 1.0))).isEmpty)
  }

  test("union merges and sums") {
    val out = Combiner.Union(Seq(s(1L -> 2.0), s(1L -> 3.0, 2L -> 1.0)))
    assert(out == Seq(Scored(1, 5.0), Scored(2, 1.0)))
  }

  test("union of a single input is identity modulo ordering") {
    val out = Combiner.Union(Seq(s(2L -> 1.0, 1L -> 5.0)))
    assert(out == Seq(Scored(1, 5.0), Scored(2, 1.0)))
  }

  test("difference removes tables of the second input") {
    val out = Combiner.Difference(Seq(s(1L -> 2.0, 2L -> 1.0, 3L -> 5.0), s(2L -> 9.0)))
    assert(out.map(_.tableId) == Seq(3L, 1L))
  }

  test("difference is non-commutative") {
    val a = s(1L -> 1.0, 2L -> 1.0)
    val b = s(2L -> 1.0, 3L -> 1.0)
    assert(Combiner.Difference(Seq(a, b)).map(_.tableId) == Seq(1L))
    assert(Combiner.Difference(Seq(b, a)).map(_.tableId) == Seq(3L))
  }

  test("difference takes exactly two inputs") {
    intercept[IllegalArgumentException](Combiner.Difference(Seq(s(1L -> 1.0))))
    intercept[IllegalArgumentException](Combiner.Difference(Seq(s(1L -> 1.0), s(), s())))
  }

  test("counter ranks by occurrence count") {
    val out = Combiner.Counter(Seq(s(1L -> 1.0), s(1L -> 1.0, 2L -> 50.0), s(1L -> 1.0, 3L -> 1.0)))
    assert(out.head.tableId == 1L)
    assert(out.head.score >= 3.0)
    // 2 and 3 both occur once; score tiebreak favors the higher sum.
    assert(out(1).tableId == 2L)
  }

  test("counter tiebreak never promotes a lower count above a higher count") {
    val out = Combiner.Counter(Seq(s(1L -> 1e9), s(2L -> 0.1), s(2L -> 0.1)))
    assert(out.head.tableId == 2L) // count 2 beats count 1 regardless of score
  }

  test("rankings are deterministic: score desc then table id asc") {
    val out = Combiner.Union(Seq(s(5L -> 1.0, 3L -> 1.0, 4L -> 2.0)))
    assert(out.map(_.tableId) == Seq(4L, 3L, 5L))
  }
}
