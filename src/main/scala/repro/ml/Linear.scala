package repro.ml

import repro.linalg.Mat

/** Ordinary least squares / ridge linear regression (normal equations via
  * Cholesky) — the "LinearR" comparator in Fig 16.
  */
final class LinearRegression private (val weights: Array[Double], val bias: Double) {
  def predict(x: Array[Double]): Double = {
    var s = bias; var i = 0
    while (i < x.length) { s += weights(i) * x(i); i += 1 }
    s
  }
}

object LinearRegression {
  def fit(x: Seq[Array[Double]], y: Seq[Double], ridge: Double = 1e-8): LinearRegression = {
    require(x.nonEmpty && x.size == y.size, "linear regression needs equal non-empty x/y")
    val n = x.size; val d = x.head.length
    // augmented design with intercept column
    val xtx = Mat.zeros(d + 1, d + 1)
    val xty = new Array[Double](d + 1)
    x.zip(y).foreach { case (xi, yi) =>
      val aug = xi :+ 1.0
      for (a <- 0 to d; b <- a to d) {
        xtx(a, b) += aug(a) * aug(b)
        if (a != b) xtx(b, a) = xtx(a, b)
      }
      for (a <- 0 to d) xty(a) += aug(a) * yi
    }
    var i = 0
    while (i <= d) { xtx(i, i) += ridge * n; i += 1 }
    val l = Mat.cholesky(xtx)
    val w = Mat.choleskySolve(l, xty)
    new LinearRegression(w.take(d), w(d))
  }
}

/** Logistic regression by gradient descent — the "LR" comparator in Fig 16.
  *
  * The paper (oddly) lists logistic regression among *regression* models for
  * execution time; following common practice for that comparison we binarize
  * the target around its median, fit LR, and predict time as
  * p·mean(high) + (1−p)·mean(low) — which is exactly why LR fares poorly.
  */
final class LogisticRegressionModel private (
    weights: Array[Double], bias: Double, loMean: Double, hiMean: Double) {
  private def sigmoid(z: Double): Double = 1.0 / (1.0 + math.exp(-z))

  def predictProb(x: Array[Double]): Double = {
    var s = bias; var i = 0
    while (i < x.length) { s += weights(i) * x(i); i += 1 }
    sigmoid(s)
  }

  /** Regression-style prediction via class-mean mixing. */
  def predict(x: Array[Double]): Double = {
    val p = predictProb(x)
    p * hiMean + (1.0 - p) * loMean
  }
}

object LogisticRegressionModel {
  def fit(x: Seq[Array[Double]], y: Seq[Double], epochs: Int = 300, lr: Double = 0.5): LogisticRegressionModel = {
    require(x.size == y.size && x.nonEmpty, "lr needs equal non-empty x/y")
    val median = y.sorted.apply(y.size / 2)
    val labels = y.map(v => if (v > median) 1.0 else 0.0)
    val lo = y.zip(labels).collect { case (v, 0.0) => v }
    val hi = y.zip(labels).collect { case (v, 1.0) => v }
    val loMean = if (lo.isEmpty) y.min else lo.sum / lo.size
    val hiMean = if (hi.isEmpty) y.max else hi.sum / hi.size
    val d = x.head.length
    val w = new Array[Double](d)
    var b = 0.0
    var e = 0
    while (e < epochs) {
      val gw = new Array[Double](d)
      var gb = 0.0
      x.indices.foreach { i =>
        var z = b; var j = 0
        while (j < d) { z += w(j) * x(i)(j); j += 1 }
        val p = 1.0 / (1.0 + math.exp(-z))
        val err = p - labels(i)
        j = 0
        while (j < d) { gw(j) += err * x(i)(j); j += 1 }
        gb += err
      }
      var j = 0
      while (j < d) { w(j) -= lr * gw(j) / x.size; j += 1 }
      b -= lr * gb / x.size
      e += 1
    }
    new LogisticRegressionModel(w, b, loMean, hiMean)
  }
}
