package repro.ml

/** CART regression tree with variance-reduction splits.
  *
  * Substrate for GBRT (DAC's model family and the Fig 16/17 comparator).
  * Splits scan sorted unique thresholds per feature; no pruning beyond
  * `maxDepth` / `minSamplesLeaf`.
  */
final class RegressionTree private (root: RegressionTree.Node, val nFeatures: Int) {
  def predict(x: Array[Double]): Double = RegressionTree.walk(root, x)

  /** Total variance reduction contributed per feature (Gini-style importance). */
  def featureImportance: Array[Double] = {
    val imp = new Array[Double](nFeatures)
    def rec(n: RegressionTree.Node): Unit = n match {
      case RegressionTree.Split(f, _, gain, l, r) => imp(f) += gain; rec(l); rec(r)
      case _ => ()
    }
    rec(root)
    imp
  }
}

object RegressionTree {
  sealed trait Node
  final case class Leaf(value: Double) extends Node
  final case class Split(feature: Int, threshold: Double, gain: Double, left: Node, right: Node) extends Node

  @annotation.tailrec
  private def walk(n: Node, x: Array[Double]): Double = n match {
    case Leaf(v) => v
    case Split(f, t, _, l, r) => if (x(f) <= t) walk(l, x) else walk(r, x)
  }

  def fit(x: Seq[Array[Double]], y: Seq[Double], maxDepth: Int = 4, minSamplesLeaf: Int = 3): RegressionTree = {
    require(x.nonEmpty && x.size == y.size, "tree needs equal non-empty x/y")
    val xa = x.toArray; val ya = y.toArray
    new RegressionTree(build(xa.indices.toArray, xa, ya, maxDepth, minSamplesLeaf), xa.head.length)
  }

  private def build(idx: Array[Int], x: Array[Array[Double]], y: Array[Double],
                    depth: Int, minLeaf: Int): Node = {
    val meanY = idx.map(y).sum / idx.length
    if (depth == 0 || idx.length < 2 * minLeaf) return Leaf(meanY)
    val sse = idx.map(i => (y(i) - meanY) * (y(i) - meanY)).sum
    if (sse < 1e-12) return Leaf(meanY)

    var bestGain = 0.0
    var bestF = -1
    var bestT = 0.0
    val d = x(idx(0)).length
    var f = 0
    while (f < d) {
      val sorted = idx.sortBy(i => x(i)(f))
      // prefix sums over sorted order for O(n) split evaluation per feature
      var leftSum = 0.0; var leftSq = 0.0
      val totSum = sorted.map(y).sum
      val totSq = sorted.map(i => y(i) * y(i)).sum
      var k = 0
      while (k < sorted.length - 1) {
        val i = sorted(k)
        leftSum += y(i); leftSq += y(i) * y(i)
        val nl = k + 1; val nr = sorted.length - nl
        val xk = x(i)(f); val xk1 = x(sorted(k + 1))(f)
        if (xk < xk1 && nl >= minLeaf && nr >= minLeaf) {
          val rightSum = totSum - leftSum; val rightSq = totSq - leftSq
          val sseL = leftSq - leftSum * leftSum / nl
          val sseR = rightSq - rightSum * rightSum / nr
          val gain = sse - sseL - sseR
          if (gain > bestGain) { bestGain = gain; bestF = f; bestT = (xk + xk1) / 2.0 }
        }
        k += 1
      }
      f += 1
    }
    if (bestF < 0) Leaf(meanY)
    else {
      val (li, ri) = idx.partition(i => x(i)(bestF) <= bestT)
      Split(bestF, bestT, bestGain,
        build(li, x, y, depth - 1, minLeaf),
        build(ri, x, y, depth - 1, minLeaf))
    }
  }
}
