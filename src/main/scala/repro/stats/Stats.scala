package repro.stats

/** Descriptive statistics used throughout LOCAT: mean, (population) standard
  * deviation, Coefficient of Variation (paper eq. 3), MSE, ranks, and the
  * Spearman Correlation Coefficient used by CPS (paper §3.3.2).
  */
object Stats {

  def mean(xs: Seq[Double]): Double = {
    require(xs.nonEmpty, "mean of empty seq")
    xs.sum / xs.size
  }

  /** Population standard deviation (divides by N, as in paper eq. 3). */
  def sd(xs: Seq[Double]): Double = {
    val m = mean(xs)
    math.sqrt(xs.map(x => (x - m) * (x - m)).sum / xs.size)
  }

  /** Coefficient of Variation: SD / mean (paper eq. 3). Zero-mean series → 0. */
  def cv(xs: Seq[Double]): Double = {
    val m = mean(xs)
    if (m == 0.0) 0.0 else sd(xs) / m
  }

  def mse(pred: Seq[Double], actual: Seq[Double]): Double = {
    require(pred.size == actual.size && pred.nonEmpty, "mse needs equal non-empty seqs")
    pred.zip(actual).map { case (p, a) => (p - a) * (p - a) }.sum / pred.size
  }

  /** Relative error used for Fig 16-style model-accuracy comparison. */
  def meanRelativeError(pred: Seq[Double], actual: Seq[Double]): Double = {
    require(pred.size == actual.size && pred.nonEmpty, "mre needs equal non-empty seqs")
    pred.zip(actual).map { case (p, a) => math.abs(p - a) / math.max(1e-12, math.abs(a)) }.sum / pred.size
  }

  /** Fractional ranks with ties averaged (the convention Spearman requires). */
  def ranks(xs: Seq[Double]): Array[Double] = {
    val n = xs.size
    val sortedIdx = xs.indices.sortBy(xs)
    val out = new Array[Double](n)
    var i = 0
    while (i < n) {
      var j = i
      // group ties: xs at sortedIdx(i..j) all equal
      while (j + 1 < n && xs(sortedIdx(j + 1)) == xs(sortedIdx(i))) j += 1
      val avgRank = (i + j) / 2.0 + 1.0 // ranks are 1-based
      var k = i
      while (k <= j) { out(sortedIdx(k)) = avgRank; k += 1 }
      i = j + 1
    }
    out
  }

  def pearson(xs: Seq[Double], ys: Seq[Double]): Double = {
    require(xs.size == ys.size && xs.size >= 2, "pearson needs >=2 paired values")
    val mx = mean(xs); val my = mean(ys)
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    xs.indices.foreach { i =>
      val dx = xs(i) - mx; val dy = ys(i) - my
      sxy += dx * dy; sxx += dx * dx; syy += dy * dy
    }
    if (sxx == 0.0 || syy == 0.0) 0.0 else sxy / math.sqrt(sxx * syy)
  }

  /** Spearman Correlation Coefficient: Pearson correlation of the ranks.
    * Handles ties via average ranks; constant series give SCC = 0.
    */
  def spearman(xs: Seq[Double], ys: Seq[Double]): Double =
    pearson(ranks(xs).toSeq, ranks(ys).toSeq)

  /** Standard normal PDF / CDF (Abramowitz–Stegun erf approximation), used by EI. */
  def normPdf(z: Double): Double = math.exp(-0.5 * z * z) / math.sqrt(2.0 * math.Pi)

  def normCdf(z: Double): Double = 0.5 * (1.0 + erf(z / math.sqrt(2.0)))

  def erf(x: Double): Double = {
    // Abramowitz & Stegun 7.1.26, |error| < 1.5e-7
    val sign = if (x < 0) -1.0 else 1.0
    val ax = math.abs(x)
    val t = 1.0 / (1.0 + 0.3275911 * ax)
    val y = 1.0 - (((((1.061405429 * t - 1.453152027) * t) + 1.421413741) * t - 0.284496736) * t + 0.254829592) * t * math.exp(-ax * ax)
    sign * y
  }
}
