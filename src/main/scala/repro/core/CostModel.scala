package repro.core

/** Learning-based cost estimation (paper §VII-B): one linear regression per
  * seeker type over the design vector [1, log1p(card Q), #cols,
  * log1p(avg value frequency)], trained offline on measured runtimes of
  * sampled queries. Ordinary least squares with a small ridge term, solved
  * by Gaussian elimination — no external library needed for 4 unknowns.
  */
final class CostModel(val weights: Map[SeekerType, Array[Double]]) {

  /** Predicted runtime (ms) of a seeker invocation. Types without a trained
    * model predict 0, so ordering falls back to the rule ranking plus the
    * plan's stable order.
    */
  def predictMs(tpe: SeekerType, f: SeekerFeatures): Double =
    weights.get(tpe) match {
      case Some(w) => math.max(0.0, dot(w, f.design))
      case None    => 0.0
    }

  private def dot(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }
}

object CostModel {

  /** A model with no trained weights — rule-based ordering only. */
  val untrained: CostModel = new CostModel(Map.empty)

  /** One training sample: features of an executed seeker and its measured
    * wall-clock runtime in milliseconds.
    */
  final case class Sample(features: SeekerFeatures, runtimeMs: Double)

  def train(samples: Map[SeekerType, Seq[Sample]]): CostModel = {
    val ws = samples.collect {
      case (tpe, ss) if ss.nonEmpty =>
        tpe -> fit(ss.map(s => (s.features.design, s.runtimeMs)))
    }
    new CostModel(ws)
  }

  /** OLS fit: solve (XᵀX + λI) w = Xᵀy. */
  private[core] def fit(rows: Seq[(Array[Double], Double)], ridge: Double = 1e-6): Array[Double] = {
    val d = rows.head._1.length
    val xtx = Array.ofDim[Double](d, d)
    val xty = Array.ofDim[Double](d)
    for ((x, y) <- rows) {
      var i = 0
      while (i < d) {
        xty(i) += x(i) * y
        var j = 0
        while (j < d) { xtx(i)(j) += x(i) * x(j); j += 1 }
        i += 1
      }
    }
    var i = 0
    while (i < d) { xtx(i)(i) += ridge; i += 1 }
    solve(xtx, xty)
  }

  /** Gaussian elimination with partial pivoting. */
  private[core] def solve(a: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = b.length
    val m = a.map(_.clone())
    val y = b.clone()
    for (col <- 0 until n) {
      var pivot = col
      for (r <- col + 1 until n) if (math.abs(m(r)(col)) > math.abs(m(pivot)(col))) pivot = r
      if (pivot != col) {
        val tmp = m(col); m(col) = m(pivot); m(pivot) = tmp
        val t2 = y(col); y(col) = y(pivot); y(pivot) = t2
      }
      val p = m(col)(col)
      if (math.abs(p) > 1e-12) {
        for (r <- col + 1 until n) {
          val f = m(r)(col) / p
          if (f != 0.0) {
            for (c <- col until n) m(r)(c) -= f * m(col)(c)
            y(r) -= f * y(col)
          }
        }
      }
    }
    val w = Array.ofDim[Double](n)
    for (r <- (n - 1) to 0 by -1) {
      var s = y(r)
      for (c <- r + 1 until n) s -= m(r)(c) * w(c)
      w(r) = if (math.abs(m(r)(r)) > 1e-12) s / m(r)(r) else 0.0
    }
    w
  }
}
