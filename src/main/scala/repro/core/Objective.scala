package repro.core

/** Result of executing a (possibly query-reduced) Spark SQL application once.
  *
  * @param perQuerySeconds execution time of each executed query, in order
  * @param gcSeconds       total JVM GC time attributed to the run
  */
final case class ExecResult(perQuerySeconds: Map[String, Double], gcSeconds: Double) {
  /** Total application wall time: queries run sequentially. */
  def totalSeconds: Double = perQuerySeconds.values.sum
}

/** What every tuner optimizes against: run the application with a
  * configuration at a datasize, optionally restricted to a query subset
  * (LOCAT's RQA), and observe execution metrics.
  *
  * Implementations: `repro.cluster.SparkClusterSimulator` (paper-scale
  * experiments) and `repro.sparkexec.SparkObjective` (real Spark session).
  */
trait TuningObjective {
  /** Query identifiers of the full application, in execution order. */
  def queries: Seq[String]

  /** Execute once. `subset = None` runs the full application. */
  def run(conf: ConfigValues, datasizeGB: Double, subset: Option[Seq[String]] = None): ExecResult

  /** Human-readable workload name (bench reporting). */
  def workloadName: String
}

/** One observed execution during tuning. `costSeconds` is the wall time the
  * tuner *paid* for this observation (the RQA costs less than the full app).
  */
final case class Trial(conf: ConfigValues, datasizeGB: Double, result: ExecResult,
                       costSeconds: Double, fullApp: Boolean)

/** Outcome of a tuning session.
  *
  * @param bestConf        best configuration found (full parameter set)
  * @param bestTimeSeconds full-application time of `bestConf` as observed/verified
  * @param optimizationSeconds total execution time spent to find it (the
  *                        paper's "optimization time"), excluding negligible
  *                        model-fitting CPU
  * @param trials          full history
  */
final case class TuningResult(
    tunerName: String,
    bestConf: ConfigValues,
    bestTimeSeconds: Double,
    optimizationSeconds: Double,
    trials: Seq[Trial],
)

/** A configuration auto-tuner (LOCAT or one of the four SOTA baselines). */
trait Tuner {
  def name: String

  /** Tune `objective` on `space` for input size `datasizeGB`. */
  def tune(objective: TuningObjective, space: ConfigSpace, datasizeGB: Double, seed: Long): TuningResult
}
