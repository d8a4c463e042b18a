package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  private val truth = Set(1L, 2L, 3L, 4L)

  test("precision@k counts relevant items in the top k") {
    assert(Metrics.precisionAtK(Seq(1, 9, 2, 8), truth, 4) == 0.5)
  }

  test("precision@k on empty prediction is zero") {
    assert(Metrics.precisionAtK(Seq.empty, truth, 10) == 0.0)
  }

  test("precision@k uses the actual top size when fewer than k") {
    assert(Metrics.precisionAtK(Seq(1L, 2L), truth, 10) == 1.0)
  }

  test("recall@k divides by the truth size") {
    assert(Metrics.recallAtK(Seq(1, 9, 2, 8), truth, 4) == 0.5)
  }

  test("recall of empty truth is zero") {
    assert(Metrics.recallAtK(Seq(1L), Set.empty, 5) == 0.0)
  }

  test("perfect ranking has AP 1.0") {
    assert(Metrics.averagePrecisionAtK(Seq(1, 2, 3, 4), truth, 4) == 1.0)
  }

  test("AP penalizes late hits") {
    val ap = Metrics.averagePrecisionAtK(Seq(9, 8, 7, 1), truth, 4)
    assert(ap > 0.0 && ap < 0.3)
  }

  test("AP with no hits is zero") {
    assert(Metrics.averagePrecisionAtK(Seq(9, 8), truth, 2) == 0.0)
  }

  test("AP normalizes by min(k, truth size)") {
    // truth has 4 elements, k=2, both hits at top -> AP = 1.
    assert(Metrics.averagePrecisionAtK(Seq(1, 2), truth, 2) == 1.0)
  }

  test("MAP averages over queries") {
    val qs = Seq(
      (Seq(1L, 2L), Set(1L, 2L)), // AP 1
      (Seq(9L, 8L), Set(1L)),     // AP 0
    )
    assert(Metrics.mapAtK(qs, 2) == 0.5)
  }

  test("pearson of a perfect linear relation is 1") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Metrics.pearson(xs, xs.map(_ * 2 + 1)) - 1.0) < 1e-12)
  }

  test("pearson of a negated relation is -1") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Metrics.pearson(xs, xs.map(-_)) + 1.0) < 1e-12)
  }

  test("pearson of a constant column is 0") {
    assert(Metrics.pearson(Seq(1.0, 2.0, 3.0), Seq(5.0, 5.0, 5.0)) == 0.0)
  }

  test("pearson of fewer than two points is 0") {
    assert(Metrics.pearson(Seq(1.0), Seq(2.0)) == 0.0)
  }

  test("pearson is symmetric") {
    val xs = Seq(1.0, 5.0, 2.0, 8.0, 3.0)
    val ys = Seq(2.0, 4.0, 1.0, 9.0, 2.5)
    assert(math.abs(Metrics.pearson(xs, ys) - Metrics.pearson(ys, xs)) < 1e-12)
  }
}
