package repro.core

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite

class CostModelSpec extends AnyFunSuite {

  test("solve inverts a known linear system") {
    val a = Array(Array(2.0, 1.0), Array(1.0, 3.0))
    val b = Array(5.0, 10.0)
    val x = CostModel.solve(a, b)
    assert(math.abs(x(0) - 1.0) < 1e-9)
    assert(math.abs(x(1) - 3.0) < 1e-9)
  }

  test("solve handles pivoting (zero on the diagonal)") {
    val a = Array(Array(0.0, 1.0), Array(1.0, 0.0))
    val b = Array(2.0, 3.0)
    val x = CostModel.solve(a, b)
    assert(math.abs(x(0) - 3.0) < 1e-9)
    assert(math.abs(x(1) - 2.0) < 1e-9)
  }

  test("fit recovers exact linear weights") {
    val rnd = new Random(1)
    val w = Array(3.0, 2.0, -1.0, 0.5)
    val rows = Seq.fill(100) {
      val x = Array(1.0, rnd.nextDouble() * 10, rnd.nextDouble() * 5, rnd.nextDouble() * 8)
      (x, x.zip(w).map { case (a, b) => a * b }.sum)
    }
    val got = CostModel.fit(rows)
    w.indices.foreach(i => assert(math.abs(got(i) - w(i)) < 1e-6, s"weight $i"))
  }

  test("fit tolerates noise and still ranks correctly") {
    val rnd = new Random(2)
    // runtime grows with card; noise of +-5.
    val rows = Seq.fill(200) {
      val card = rnd.nextDouble() * 1000
      val f = SeekerFeatures(card, 1, 10)
      (f.design, 10 + 3 * math.log1p(card) + rnd.nextGaussian() * 0.5)
    }
    val w = CostModel.fit(rows)
    val model = new CostModel(Map(SeekerType.SC -> w))
    val cheap = model.predictMs(SeekerType.SC, SeekerFeatures(10, 1, 10))
    val costly = model.predictMs(SeekerType.SC, SeekerFeatures(900, 1, 10))
    assert(cheap < costly)
  }

  test("untrained model predicts zero") {
    assert(CostModel.untrained.predictMs(SeekerType.MC, SeekerFeatures(100, 2, 5)) == 0.0)
  }

  test("train builds one model per seeker type with samples") {
    val samples = Map[SeekerType, Seq[CostModel.Sample]](
      SeekerType.SC -> Seq.tabulate(10)(i => CostModel.Sample(SeekerFeatures(i * 10.0, 1, 1), i * 5.0)),
      SeekerType.MC -> Seq.empty,
    )
    val m = CostModel.train(samples)
    assert(m.weights.contains(SeekerType.SC))
    assert(!m.weights.contains(SeekerType.MC))
  }

  test("predictions are clamped at zero") {
    val m = new CostModel(Map(SeekerType.KW -> Array(-100.0, 0.0, 0.0, 0.0)))
    assert(m.predictMs(SeekerType.KW, SeekerFeatures(1, 1, 1)) == 0.0)
  }

  test("design vector applies log1p to card and frequency") {
    val d = SeekerFeatures(99, 2, 999).design
    assert(d(0) == 1.0)
    assert(math.abs(d(1) - math.log1p(99)) < 1e-12)
    assert(d(2) == 2.0)
    assert(math.abs(d(3) - math.log1p(999)) < 1e-12)
  }
}
