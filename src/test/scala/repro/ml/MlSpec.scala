package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.stats.Stats
import scala.util.Random

class MlSpec extends AnyFunSuite {

  private def xor(n: Int, rng: Random): (Seq[Array[Double]], Seq[Double]) = {
    val xs = Seq.fill(n)(Array(rng.nextDouble(), rng.nextDouble()))
    val ys = xs.map(x => if ((x(0) > 0.5) != (x(1) > 0.5)) 10.0 else 0.0)
    (xs, ys)
  }

  // --- regression tree -------------------------------------------------------

  test("tree on constant target is a single leaf predicting the constant") {
    val xs = Seq.fill(10)(Array(0.5))
    val t = RegressionTree.fit(xs, Seq.fill(10)(7.0))
    assert(t.predict(Array(0.1)) == 7.0)
    assert(t.featureImportance.sum == 0.0)
  }

  test("tree recovers a step function exactly") {
    val xs = (0 until 40).map(i => Array(i / 40.0))
    val ys = xs.map(x => if (x(0) < 0.5) 1.0 else 9.0)
    val t = RegressionTree.fit(xs, ys, maxDepth = 2)
    assert(t.predict(Array(0.2)) == 1.0)
    assert(t.predict(Array(0.8)) == 9.0)
  }

  test("tree fits XOR (needs depth 2)") {
    val (xs, ys) = xor(200, new Random(1))
    val t = RegressionTree.fit(xs, ys, maxDepth = 3, minSamplesLeaf = 5)
    val preds = xs.map(t.predict)
    assert(Stats.mse(preds, ys) < 2.0)
  }

  test("tree importance concentrates on the informative feature") {
    val rng = new Random(2)
    val xs = Seq.fill(150)(Array(rng.nextDouble(), rng.nextDouble(), rng.nextDouble()))
    val ys = xs.map(x => 10 * x(1)) // only feature 1 matters
    val t = RegressionTree.fit(xs, ys, maxDepth = 4)
    val imp = t.featureImportance
    assert(imp(1) > imp(0) * 10 && imp(1) > imp(2) * 10)
  }

  test("tree respects minSamplesLeaf") {
    val xs = (0 until 10).map(i => Array(i.toDouble))
    val ys = xs.map(_(0))
    val t = RegressionTree.fit(xs, ys, maxDepth = 10, minSamplesLeaf = 5)
    // with minLeaf=5 on 10 points, at most one split is possible
    val distinct = xs.map(t.predict).distinct
    assert(distinct.size <= 2)
  }

  // --- GBRT --------------------------------------------------------------------

  test("gbrt beats a single tree and the mean predictor on a smooth function") {
    val rng = new Random(3)
    val xs = Seq.fill(200)(Array(rng.nextDouble(), rng.nextDouble()))
    val ys = xs.map(x => math.sin(x(0) * 5) + 2 * x(1))
    val gbrt = Gbrt.fit(xs, ys, nTrees = 80, maxDepth = 3)
    val tree = RegressionTree.fit(xs, ys, maxDepth = 3)
    val meanMse = Stats.mse(Seq.fill(xs.size)(Stats.mean(ys)), ys)
    val gbrtMse = Stats.mse(xs.map(gbrt.predict), ys)
    val treeMse = Stats.mse(xs.map(tree.predict), ys)
    assert(gbrtMse < treeMse)
    assert(gbrtMse < meanMse * 0.05)
  }

  test("gbrt feature importance is normalized and finds the right features") {
    val rng = new Random(4)
    val xs = Seq.fill(200)(Array.fill(5)(rng.nextDouble()))
    val ys = xs.map(x => 8 * x(2) + 3 * x(4))
    val g = Gbrt.fit(xs, ys, nTrees = 40, maxDepth = 3)
    val imp = g.featureImportance
    assert(math.abs(imp.sum - 1.0) < 1e-9)
    assert(imp(2) > imp(4) && imp(4) > imp(0) && imp(4) > imp(1) && imp(4) > imp(3))
  }

  test("gbrt with zero trees is rejected implicitly: one tree minimum behaves") {
    val xs = Seq(Array(0.0), Array(1.0), Array(2.0), Array(3.0))
    val g = Gbrt.fit(xs, Seq(1.0, 2.0, 3.0, 4.0), nTrees = 1, maxDepth = 1, minSamplesLeaf = 1)
    assert(g.trees.size == 1)
  }

  // --- linear / logistic --------------------------------------------------------

  test("OLS recovers exact linear coefficients") {
    val rng = new Random(5)
    val xs = Seq.fill(50)(Array(rng.nextDouble(), rng.nextDouble()))
    val ys = xs.map(x => 3.0 * x(0) - 2.0 * x(1) + 0.5)
    val m = LinearRegression.fit(xs, ys)
    assert(math.abs(m.weights(0) - 3.0) < 1e-6)
    assert(math.abs(m.weights(1) + 2.0) < 1e-6)
    assert(math.abs(m.bias - 0.5) < 1e-6)
  }

  test("OLS with noise still close to truth") {
    val rng = new Random(6)
    val xs = Seq.fill(300)(Array(rng.nextDouble()))
    val ys = xs.map(x => 2.0 * x(0) + 1.0 + rng.nextGaussian() * 0.1)
    val m = LinearRegression.fit(xs, ys)
    assert(math.abs(m.weights(0) - 2.0) < 0.15)
  }

  test("logistic regression separates a linearly separable target") {
    val rng = new Random(7)
    val xs = Seq.fill(200)(Array(rng.nextDouble()))
    val ys = xs.map(x => if (x(0) > 0.5) 100.0 else 10.0)
    val m = LogisticRegressionModel.fit(xs, ys, epochs = 500, lr = 1.0)
    assert(m.predictProb(Array(0.9)) > 0.7)
    assert(m.predictProb(Array(0.1)) < 0.3)
    assert(m.predict(Array(0.9)) > m.predict(Array(0.1)))
  }

  // --- kernel ridge / knn ---------------------------------------------------------

  test("kernel ridge fits a nonlinearity linear regression cannot") {
    val rng = new Random(8)
    val xs = Seq.fill(120)(Array(rng.nextDouble()))
    val ys = xs.map(x => math.sin(x(0) * 2 * math.Pi))
    val kr = KernelRidge.fit(xs, ys, gamma = 10.0, lambda = 1e-3)
    val lin = LinearRegression.fit(xs, ys)
    val krMse = Stats.mse(xs.map(kr.predict), ys)
    val linMse = Stats.mse(xs.map(lin.predict), ys)
    assert(krMse < linMse * 0.1, s"kr=$krMse lin=$linMse")
  }

  test("knn with k=1 memorizes training points") {
    val xs = Seq(Array(0.0), Array(1.0), Array(2.0))
    val m = KnnRegression.fit(xs, Seq(5.0, 6.0, 7.0), k = 1)
    assert(m.predict(Array(0.01)) == 5.0)
    assert(m.predict(Array(1.9)) == 7.0)
  }

  test("knn averages the k nearest targets") {
    val xs = Seq(Array(0.0), Array(0.1), Array(5.0))
    val m = KnnRegression.fit(xs, Seq(2.0, 4.0, 100.0), k = 2)
    assert(m.predict(Array(0.05)) == 3.0)
  }

  // --- GA --------------------------------------------------------------------------

  test("GA minimizes a sphere function") {
    val r = Ga.minimize(u => u.map(v => (v - 0.6) * (v - 0.6)).sum, d = 5,
      rng = new Random(9), popSize = 30, generations = 60)
    assert(r.bestFitness < 0.01, s"fitness ${r.bestFitness}")
    r.best.foreach(v => assert(math.abs(v - 0.6) < 0.15))
  }

  test("GA keeps genomes inside the unit cube") {
    val r = Ga.minimize(u => -u.sum, d = 4, rng = new Random(10), popSize = 20, generations = 30)
    assert(r.best.forall(v => v >= 0.0 && v <= 1.0))
    // maximizing the sum → best should push toward 1
    assert(r.best.sum > 3.5)
  }

  test("GA elitism never loses the best individual") {
    val rng = new Random(11)
    def f(u: Array[Double]) = math.abs(u(0) - 0.25)
    val short = Ga.minimize(f, 1, new Random(11), popSize = 10, generations = 5)
    val long = Ga.minimize(f, 1, new Random(11), popSize = 10, generations = 50)
    assert(long.bestFitness <= short.bestFitness + 1e-12)
  }
}
