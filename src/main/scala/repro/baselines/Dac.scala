package repro.baselines

import repro.core._
import repro.ml.{Ga, Gbrt}
import scala.util.Random

/** DAC (Yu, Bei, Qian — ASPLOS 2018) — datasize-aware high-dimensional
  * configuration auto-tuning via hierarchical performance models + search.
  *
  * Structure: collect a large random sample set on the real cluster, fit a
  * boosted-tree performance model over (configuration, datasize), search the
  * model with a genetic algorithm, then validate the top model-optima on the
  * cluster. The dominant cost is the model-building sample collection — the
  * original uses thousands of samples; we scale to `nSamples` full runs
  * (every run is the full application: DAC has no QCSA-like reduction).
  */
final class Dac(
    nSamples: Int = 240,
    gaCandidates: Int = 5,
    nTrees: Int = 120,
) extends Tuner {
  override def name: String = "DAC"

  override def tune(objective: TuningObjective, space: ConfigSpace, ds: Double, seed: Long): TuningResult = {
    val rng = new Random(seed)
    var trials = Vector.empty[Trial]
    var cost = 0.0

    def eval(conf: ConfigValues): Trial = {
      val res = objective.run(conf, ds, None)
      val t = Trial(conf, ds, res, res.totalSeconds, fullApp = true)
      trials :+= t
      cost += res.totalSeconds
      t
    }

    // model-building samples (datasize recorded as a feature, per DAC)
    (0 until nSamples).foreach(_ => eval(space.random(rng)))
    val xs = trials.map(t => space.encode(t.conf) :+ ds / 1000.0)
    val ys = trials.map(t => math.log(t.result.totalSeconds))
    val model = Gbrt.fit(xs, ys, nTrees = nTrees, maxDepth = 4)

    // GA over the model; several restarts give distinct candidates
    val candidates = (0 until gaCandidates).map { k =>
      Ga.minimize(u => model.predict(u :+ ds / 1000.0), space.dim,
        new Random(seed * 31 + k), popSize = 40, generations = 50).best
    }
    // validate model-optima on the "cluster"; DAC's recommendation is the
    // best of the GA candidates (the model's output), per its protocol
    val validated = candidates.map(u => eval(space.decode(u)))
    val best = validated.minBy(_.result.totalSeconds)
    TuningResult(name, best.conf, best.result.totalSeconds, cost, trials)
  }
}
