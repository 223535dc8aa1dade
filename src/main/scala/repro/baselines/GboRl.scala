package repro.baselines

import repro.core._
import scala.util.Random

/** GBO-RL (Kunjir & Babu — SIGMOD 2020, "Black or White?") — Guided Bayesian
  * Optimization with an analytical memory model.
  *
  * The white-box part: a Spark memory model rules out configurations whose
  * executors cannot fit the cluster or whose execution memory is starved; BO
  * only spends samples on memory-feasible candidates. Everything else is
  * plain full-application GP-BO over all parameters — no query reduction, no
  * dimensionality reduction, no datasize awareness.
  */
final class GboRl(
    nInit: Int = 5,
    boIters: Int = 140,
    clusterMemGB: Double = 1536.0,
    clusterCores: Int = 384,
    workerNodes: Int = 3,
) extends Tuner {
  override def name: String = "GBO-RL"

  /** Analytical memory-feasibility model (the "white box"). Spaces without
    * memory parameters (unit tests, runtime-only spaces) are always feasible.
    */
  def memoryFeasible(conf: ConfigValues): Boolean = {
    // missing keys (subspace tuning) fall back to Spark-ish defaults
    def v(name: String, default: Double) = conf.get(name).getOrElse(default)
    if (conf.get("spark.executor.memory").isEmpty) return true
    val execMem = conf("spark.executor.memory")
    val overheadGB = v("spark.executor.memoryOverhead", 384.0) / 1024.0
    val offHeapGB = if (v("spark.memory.offHeap.enabled", 0.0) >= 0.5) v("spark.memory.offHeap.size", 0.0) / 1024.0 else 0.0
    val perExec = execMem + math.max(overheadGB, 0.375) + offHeapGB
    val instances = math.round(v("spark.executor.instances", 2.0))
    val cores = math.max(1L, math.round(v("spark.executor.cores", 1.0)))
    val memPerNode = clusterMemGB / workerNodes
    val coresPerNode = clusterCores.toDouble / workerNodes
    val fitsNode = perExec <= memPerNode && cores <= coresPerNode
    val fitsCluster = instances * perExec <= clusterMemGB * 1.05 && instances * cores <= clusterCores * 1.05
    // starved execution memory is also rejected by the model
    val execShare = execMem * v("spark.memory.fraction", 0.6) / cores
    fitsNode && fitsCluster && execShare >= 0.5
  }

  override def tune(objective: TuningObjective, space: ConfigSpace, ds: Double, seed: Long): TuningResult = {
    val rng = new Random(seed)
    val bo = BoSearch.run(objective, space, ds, rng, nInit = nInit, nIter = boIters,
      candidateFilter = memoryFeasible)
    val best = bo.best
    TuningResult(name, best.conf, best.result.totalSeconds, bo.costSeconds, bo.trials)
  }
}

object GboRl {
  /** Instantiate with the memory limits of a simulated cluster profile. */
  def forCluster(c: repro.cluster.ClusterProfile, boIters: Int = 140): GboRl =
    new GboRl(boIters = boIters, clusterMemGB = c.totalMemGB.toDouble,
      clusterCores = c.totalCores, workerNodes = c.workerNodes)
}
