package repro.ml

/** Gradient-Boosted Regression Trees (squared loss).
  *
  * Used by the DAC baseline's performance model and by the Fig 16/17
  * model-accuracy and importance comparisons. Boosting on residuals with a
  * constant learning rate; squared loss means each stage fits plain residuals.
  */
final class Gbrt private (val trees: Seq[RegressionTree], val base: Double, val learningRate: Double) {
  def predict(x: Array[Double]): Double =
    base + trees.iterator.map(_.predict(x)).sum * learningRate

  /** Importance summed over all stages, normalized to sum to 1. */
  def featureImportance: Array[Double] = {
    val d = trees.head.nFeatures
    val imp = new Array[Double](d)
    trees.foreach { t =>
      val ti = t.featureImportance
      var i = 0
      while (i < d) { imp(i) += ti(i); i += 1 }
    }
    val tot = imp.sum
    if (tot <= 0) imp else imp.map(_ / tot)
  }
}

object Gbrt {
  def fit(x: Seq[Array[Double]], y: Seq[Double],
          nTrees: Int = 80, maxDepth: Int = 3, learningRate: Double = 0.1,
          minSamplesLeaf: Int = 3): Gbrt = {
    require(x.nonEmpty && x.size == y.size, "gbrt needs equal non-empty x/y")
    val base = y.sum / y.size
    val residual = y.map(_ - base).toArray
    val trees = scala.collection.mutable.ArrayBuffer.empty[RegressionTree]
    var m = 0
    while (m < nTrees) {
      val t = RegressionTree.fit(x, residual.toSeq, maxDepth, minSamplesLeaf)
      var i = 0
      while (i < residual.length) { residual(i) -= learningRate * t.predict(x(i)); i += 1 }
      trees += t
      m += 1
    }
    new Gbrt(trees.toSeq, base, learningRate)
  }
}
