package repro.baselines

import repro.core._
import repro.ml.Gbrt
import scala.util.Random

/** Tuneful (Fekry et al. 2020) — significance-aware GP-BO.
  *
  * Two-phase structure, per the original paper:
  *  1. *Significance analysis*: rounds of random full-application executions,
  *     after which a tree-ensemble importance ranking keeps the significant
  *     parameters (the original uses incremental sensitivity analysis; we use
  *     GBRT importance over the same samples — both are tree-based filters).
  *  2. GP-BO over the significant subspace, every other parameter pinned at
  *     its Spark default.
  *
  * Not datasize-aware (re-tunes from scratch when ds changes) and never
  * removes queries — the two gaps LOCAT exploits.
  */
final class Tuneful(
    saRounds: Int = 2,
    samplesPerRound: Int = 16,
    keepParams: Int = 10,
    boIters: Int = 190,
) extends Tuner {
  override def name: String = "Tuneful"

  override def tune(objective: TuningObjective, space: ConfigSpace, ds: Double, seed: Long): TuningResult = {
    val rng = new Random(seed)
    var trials = Vector.empty[Trial]
    var cost = 0.0

    // Phase 1: significance analysis samples
    (0 until saRounds * samplesPerRound).foreach { _ =>
      val conf = space.random(rng)
      val res = objective.run(conf, ds, None)
      trials :+= Trial(conf, ds, res, res.totalSeconds, fullApp = true)
      cost += res.totalSeconds
    }
    val xs = trials.map(t => space.encode(t.conf))
    val ys = trials.map(t => math.log(t.result.totalSeconds))
    val gbrt = Gbrt.fit(xs, ys, nTrees = 60, maxDepth = 3)
    val imp = gbrt.featureImportance
    val significant = space.names.zip(imp).sortBy { case (_, i) => -i }.take(keepParams).map(_._1)

    // Phase 2: GP-BO over the significant subspace, others pinned at defaults
    val sub = space.subspace(significant)
    val pinned = space.defaults.values.view.filterKeys(n => !significant.contains(n)).toMap
    val bo = BoSearch.run(objective, sub, ds, rng, nInit = 3, nIter = boIters, pinned = pinned)
    trials ++= bo.trials
    cost += bo.costSeconds

    val best = trials.minBy(_.result.totalSeconds)
    TuningResult(name, best.conf, best.result.totalSeconds, cost, trials)
  }
}
