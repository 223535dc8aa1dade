package repro.gp

import repro.stats.Stats
import scala.util.Random

/** Expected Improvement with MCMC hyperparameter marginalization
  * (Snoek et al. 2012), LOCAT's acquisition function (paper §3.4).
  *
  * Instead of point-estimating the GP hyperparameters, we draw `nSamples`
  * hyperparameter vectors from their posterior (Metropolis–Hastings on the
  * log marginal likelihood with a broad N(0, 2²) log-space prior) and average
  * the EI under each fitted GP.
  */
object EiMcmc {

  /** One GP per posterior hyperparameter sample. */
  final case class Marginalized(gps: Seq[GaussianProcess]) {
    def predict(x: Array[Double]): (Double, Double) = {
      // Mixture moments: mean of means; variance = mean(var + mean²) − mean²
      val ms = gps.map(_.predict(x))
      val mu = ms.map(_._1).sum / ms.size
      val second = ms.map { case (m, s) => s * s + m * m }.sum / ms.size
      (mu, math.sqrt(math.max(second - mu * mu, 1e-12)))
    }

    /** Expected improvement (minimization) averaged over hyper samples. */
    def ei(x: Array[Double], best: Double, xi: Double = 0.0): Double = {
      var tot = 0.0
      gps.foreach { gp =>
        val (mu, sd) = gp.predict(x)
        val imp = best - mu - xi
        tot += (if (sd < 1e-12) math.max(imp, 0.0)
                else imp * Stats.normCdf(imp / sd) + sd * Stats.normPdf(imp / sd))
      }
      tot / gps.size
    }
  }

  /** MH-sample `nSamples` hyper vectors and fit one GP each.
    *
    * `nBurn` steps of burn-in, then `thin`-spaced draws. Each likelihood
    * evaluation refits a Cholesky (O(n³)), so callers cap the training-set
    * size (the tuners keep n ≤ ~120).
    */
  def fitMarginalized(kernel: GpKernel, x: Seq[Array[Double]], y: Seq[Double], rng: Random,
                      nSamples: Int = 5, nBurn: Int = 15, thin: Int = 3,
                      proposalSd: Double = 0.25): Marginalized = {
    val d = x.head.length
    var current = GaussianProcess.defaultLogHypers(kernel, d)
    var currentGp = GaussianProcess.fit(kernel, x, y, current)
    var currentLp = logPosterior(currentGp)
    val draws = scala.collection.mutable.ArrayBuffer.empty[GaussianProcess]
    val totalSteps = nBurn + nSamples * thin
    var step = 0
    while (step < totalSteps) {
      val proposal = current.map(h => h + rng.nextGaussian() * proposalSd)
      val tryGp =
        try Some(GaussianProcess.fit(kernel, x, y, proposal))
        catch { case _: IllegalStateException => None }
      tryGp.foreach { gp =>
        val lp = logPosterior(gp)
        if (math.log(rng.nextDouble() + 1e-300) < lp - currentLp) {
          current = proposal; currentGp = gp; currentLp = lp
        }
      }
      step += 1
      if (step > nBurn && (step - nBurn) % thin == 0) draws += currentGp
    }
    if (draws.isEmpty) draws += currentGp
    Marginalized(draws.toSeq)
  }

  private def logPosterior(gp: GaussianProcess): Double = {
    // broad zero-mean Gaussian prior over log-hypers, sd = 2
    val prior = gp.logHypers.map(h => -0.5 * h * h / 4.0).sum
    gp.logMarginalLikelihood + prior
  }

  /** Maximize EI over a random candidate pool plus local perturbations of the
    * incumbent. Returns (bestCandidate, itsEI).
    */
  def argmaxEi(model: Marginalized, best: Double, d: Int, rng: Random,
               incumbent: Option[Array[Double]] = None,
               nRandom: Int = 256, nLocal: Int = 64): (Array[Double], Double) = {
    val pool = scala.collection.mutable.ArrayBuffer.empty[Array[Double]]
    var i = 0
    while (i < nRandom) { pool += Array.fill(d)(rng.nextDouble()); i += 1 }
    incumbent.foreach { inc =>
      var j = 0
      while (j < nLocal) {
        pool += inc.map(v => clamp01(v + rng.nextGaussian() * 0.08))
        j += 1
      }
    }
    var bestX = pool.head
    var bestEi = Double.NegativeInfinity
    pool.foreach { c =>
      val e = model.ei(c, best)
      if (e > bestEi) { bestEi = e; bestX = c }
    }
    (bestX, bestEi)
  }

  private def clamp01(v: Double): Double = math.min(1.0, math.max(0.0, v))
}
