package repro.baselines

import repro.core._
import repro.ml.Gbrt
import scala.util.Random

/** QTune (Li et al. — VLDB 2019) — reinforcement-learning configuration tuner.
  *
  * The original is a DDPG actor-critic over database knobs. We implement the
  * same control loop at matching sample cost (documented substitution,
  * DESIGN.md §2): a critic (boosted-tree value model, refit periodically)
  * estimates execution time from the action (configuration); the actor picks
  * actions by perturbing the best critic-scored action with
  * exploration noise that decays over episodes, plus ε-greedy random
  * exploration. Every episode executes the full application once — RL's
  * sample-inefficiency is exactly why QTune is the slowest comparator in the
  * paper (9.2–9.7× LOCAT's optimization time).
  */
final class QTuneRl(
    episodes: Int = 320,
    criticRefit: Int = 15,
    epsilon0: Double = 0.5,
    noise0: Double = 0.30,
) extends Tuner {
  override def name: String = "QTune"

  override def tune(objective: TuningObjective, space: ConfigSpace, ds: Double, seed: Long): TuningResult = {
    val rng = new Random(seed)
    var trials = Vector.empty[Trial]
    var cost = 0.0
    var critic: Option[Gbrt] = None

    def eval(u: Array[Double]): Double = {
      val conf = space.decode(u)
      val res = objective.run(conf, ds, None)
      trials :+= Trial(conf, ds, res, res.totalSeconds, fullApp = true)
      cost += res.totalSeconds
      res.totalSeconds
    }

    var bestU = space.randomUnit(rng)
    var bestT = eval(bestU)

    var ep = 1
    while (ep < episodes) {
      val frac = ep.toDouble / episodes
      val eps = epsilon0 * (1.0 - frac)
      val noise = noise0 * (1.0 - 0.8 * frac)
      val action: Array[Double] =
        if (rng.nextDouble() < eps) space.randomUnit(rng)
        else critic match {
          case Some(cr) =>
            // actor step, DDPG-style: the policy follows the critic's value
            // estimate over the action space (global candidates plus local
            // refinements of the incumbent), with exploration noise on top
            val cands = Array.fill(16)(space.randomUnit(rng)) ++
              Array.fill(8)(bestU.map(v => clamp(v + rng.nextGaussian() * noise)))
            val greedy = cands.minBy(u => cr.predict(u))
            greedy.map(v => clamp(v + rng.nextGaussian() * noise * 0.5))
          case None => bestU.map(v => clamp(v + rng.nextGaussian() * noise))
        }
      val t = eval(action)
      if (t < bestT) { bestT = t; bestU = space.encode(trials.last.conf) }
      if (ep % criticRefit == 0) {
        val xs = trials.map(tr => space.encode(tr.conf))
        val ys = trials.map(tr => math.log(tr.result.totalSeconds))
        critic = Some(Gbrt.fit(xs, ys, nTrees = 60, maxDepth = 3))
      }
      ep += 1
    }

    val best = trials.minBy(_.result.totalSeconds)
    TuningResult(name, best.conf, best.result.totalSeconds, cost, trials)
  }

  private def clamp(v: Double): Double = math.min(1.0, math.max(0.0, v))
}
