package repro.gp

/** GP covariance functions.
  *
  * Hyperparameters are passed in log-space as a flat vector:
  * `[log σf, log ℓ₁ … log ℓ_d]` for ARD, or `[log σf, log ℓ]` for isotropic.
  * (Observation noise is handled by the GP itself, not the kernel.)
  */
sealed trait GpKernel {
  /** Number of hyperparameters for input dimensionality d. */
  def nHypers(d: Int): Int
  def apply(x: Array[Double], y: Array[Double], logHypers: Array[Double]): Double
}

object GpKernel {
  private def sqDistScaled(x: Array[Double], y: Array[Double], logHypers: Array[Double], ard: Boolean): Double = {
    var s = 0.0; var i = 0
    while (i < x.length) {
      val l = math.exp(if (ard) logHypers(1 + i) else logHypers(1))
      val d = (x(i) - y(i)) / l
      s += d * d; i += 1
    }
    s
  }

  /** Squared-exponential (Gaussian / RBF) kernel. */
  final case class SquaredExp(ard: Boolean) extends GpKernel {
    def nHypers(d: Int): Int = if (ard) 1 + d else 2
    def apply(x: Array[Double], y: Array[Double], logHypers: Array[Double]): Double = {
      val sf2 = math.exp(2.0 * logHypers(0))
      sf2 * math.exp(-0.5 * sqDistScaled(x, y, logHypers, ard))
    }
  }

  /** Matern 5/2 — the standard choice for BO over machine configurations. */
  final case class Matern52(ard: Boolean) extends GpKernel {
    def nHypers(d: Int): Int = if (ard) 1 + d else 2
    def apply(x: Array[Double], y: Array[Double], logHypers: Array[Double]): Double = {
      val sf2 = math.exp(2.0 * logHypers(0))
      val r = math.sqrt(sqDistScaled(x, y, logHypers, ard))
      val a = math.sqrt(5.0) * r
      sf2 * (1.0 + a + a * a / 3.0) * math.exp(-a)
    }
  }
}
