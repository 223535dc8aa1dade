package repro.baselines

import repro.core._
import scala.util.Random

/** Objective wrapper: restrict execution to an RQA subset and pin dropped
  * parameters — the machinery for grafting QCSA/IICP onto the SOTA tuners
  * (paper §5.10, Fig 21).
  */
final class SubsetPinnedObjective(
    inner: TuningObjective,
    rqa: Seq[String],
    pinned: Map[String, Double],
) extends TuningObjective {
  override def workloadName: String = inner.workloadName
  override def queries: Seq[String] = rqa
  override def run(conf: ConfigValues, ds: Double, subset: Option[Seq[String]]): ExecResult =
    inner.run(ConfigValues(pinned ++ conf.values), ds, Some(subset.getOrElse(rqa)))
}

/** Graft LOCAT's QCSA and/or IICP sample-reduction onto any base tuner:
  *  - a shared random-sampling phase provides the QCSA/IICP observations
  *    (full-application runs, cost counted);
  *  - with QCSA, the base tuner then optimizes the RQA only (cheaper runs);
  *  - with IICP, it searches only the CPS-kept subspace, the rest pinned at
  *    the best sampled configuration (the KPCA extraction is DAGP-specific
  *    and is not grafted — documented simplification, DESIGN.md §2);
  *  - the final best configuration is verified with one full run.
  */
final class QcsaIicpGraft(
    base: Tuner,
    useQcsa: Boolean,
    useIicp: Boolean,
    nQcsa: Int = 30,
    nIicp: Int = 20,
) extends Tuner {
  override def name: String = {
    val tag = (if (useQcsa) "+QCSA" else "") + (if (useIicp) "+IICP" else "")
    s"${base.name}$tag"
  }

  override def tune(objective: TuningObjective, space: ConfigSpace, ds: Double, seed: Long): TuningResult = {
    val rng = new Random(seed * 17 + 5)
    var trials = Vector.empty[Trial]
    var cost = 0.0

    val nSampling = if (useQcsa) nQcsa else if (useIicp) nIicp else 0
    val samples = (0 until nSampling).map { _ =>
      val conf = space.random(rng)
      val res = objective.run(conf, ds, None)
      trials :+= Trial(conf, ds, res, res.totalSeconds, fullApp = true)
      cost += res.totalSeconds
      (conf, res)
    }

    val rqa =
      if (useQcsa) Qcsa.analyze(samples.map(_._2.perQuerySeconds), objective.queries).rqa
      else objective.queries

    val (searchSpace, pinned) =
      if (useIicp) {
        val iicpSamples = samples.take(nIicp).map { case (c, r) => (c, r.totalSeconds) }
        val kept = Iicp.cps(space, iicpSamples).map(_._1)
        val bestSample = samples.minBy(_._2.totalSeconds)._1
        val keptSet = kept.toSet
        (space.subspace(kept), bestSample.values.view.filterKeys(k => !keptSet(k)).toMap)
      } else (space, Map.empty[String, Double])

    val wrapped = new SubsetPinnedObjective(objective, rqa, pinned)
    val inner = base.tune(wrapped, searchSpace, ds, seed)
    trials ++= inner.trials.map(t => t.copy(conf = ConfigValues(pinned ++ t.conf.values), fullApp = !useQcsa))
    cost += inner.optimizationSeconds

    // verify the best configuration on the full application
    val bestConf = ConfigValues(pinned ++ inner.bestConf.values)
    val verify = objective.run(bestConf, ds, None)
    trials :+= Trial(bestConf, ds, verify, verify.totalSeconds, fullApp = true)
    cost += verify.totalSeconds
    TuningResult(name, bestConf, verify.totalSeconds, cost, trials)
  }
}
