package repro.core

/** Quality metrics used throughout §VIII of the paper. */
object Metrics {

  def precisionAtK(pred: Seq[Long], truth: Set[Long], k: Int): Double = {
    val top = pred.take(k)
    if (top.isEmpty) 0.0 else top.count(truth.contains).toDouble / top.size
  }

  def recallAtK(pred: Seq[Long], truth: Set[Long], k: Int): Double =
    if (truth.isEmpty) 0.0
    else pred.take(k).count(truth.contains).toDouble / truth.size

  /** Average precision @k for one query: mean of precision at each relevant
    * hit position, normalized by min(k, |truth|).
    */
  def averagePrecisionAtK(pred: Seq[Long], truth: Set[Long], k: Int): Double = {
    if (truth.isEmpty) return 0.0
    val top = pred.take(k)
    var hits = 0
    var sum = 0.0
    for ((id, i) <- top.zipWithIndex if truth.contains(id)) {
      hits += 1
      sum += hits.toDouble / (i + 1)
    }
    if (hits == 0) 0.0 else sum / math.min(k, truth.size)
  }

  /** Mean over queries of [[averagePrecisionAtK]]. */
  def mapAtK(queries: Seq[(Seq[Long], Set[Long])], k: Int): Double =
    if (queries.isEmpty) 0.0
    else queries.map { case (p, t) => averagePrecisionAtK(p, t, k) }.sum / queries.size

  /** Exact Pearson correlation coefficient (ground truth for Table VII). */
  def pearson(xs: Seq[Double], ys: Seq[Double]): Double = {
    require(xs.length == ys.length, "pearson: unequal lengths")
    val n = xs.length
    if (n < 2) return 0.0
    val mx = xs.sum / n
    val my = ys.sum / n
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    var i = 0
    while (i < n) {
      val dx = xs(i) - mx; val dy = ys(i) - my
      sxy += dx * dy; sxx += dx * dx; syy += dy * dy
      i += 1
    }
    if (sxx == 0.0 || syy == 0.0) 0.0 else sxy / math.sqrt(sxx * syy)
  }
}
