package repro.gp

import scala.util.Random

/** Latin Hypercube Sampling over the unit hypercube [0,1]^d.
  *
  * LOCAT starts BO with three LHS samples (paper §3.4 "Start points").
  * Each dimension is cut into `n` equal strata; every stratum is hit exactly
  * once per dimension, with strata order shuffled independently per dimension.
  */
object Lhs {
  def sample(n: Int, d: Int, rng: Random): Seq[Array[Double]] = {
    require(n >= 1 && d >= 1, s"lhs needs n>=1, d>=1 (got n=$n d=$d)")
    val cols = Array.fill(d) {
      val perm = rng.shuffle((0 until n).toVector)
      perm.map(s => (s + rng.nextDouble()) / n).toArray
    }
    (0 until n).map(i => Array.tabulate(d)(j => cols(j)(i)))
  }
}
