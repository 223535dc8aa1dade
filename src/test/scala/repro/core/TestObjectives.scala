package repro.core

import scala.util.Random

/** Cheap synthetic objectives for tuner unit tests — no Spark, no simulator.
  *
  * `SyntheticObjective` models an application of three queries:
  *  - "sens1"/"sens2": sensitive to the first two *named* parameters
  *    (quadratic bowls with distinct optima);
  *  - "insens": constant apart from observation noise.
  * Every other parameter is a pure distractor. Time is multiplied by
  * `1 + ds/1000` so datasize-awareness is testable.
  */
final class SyntheticObjective(
    val space: ConfigSpace,
    sensParams: Seq[String],
    noiseSd: Double = 0.01,
    seed: Long = 0,
) extends TuningObjective {
  require(sensParams.size == 2, "SyntheticObjective wants exactly 2 sensitive params")
  private val rng = new Random(seed)
  var runCount: Int = 0

  override def workloadName: String = "synthetic"
  override def queries: Seq[String] = Seq("sens1", "sens2", "insens")

  private def unitOf(conf: ConfigValues, p: String): Double = {
    val param = space.params.find(_.name == p).get
    val (lo, hi) = space.range(param)
    (conf(p) - lo) / (hi - lo)
  }

  def expected(conf: ConfigValues, ds: Double): Map[String, Double] = {
    val u1 = unitOf(conf, sensParams.head)
    val u2 = unitOf(conf, sensParams(1))
    val scale = 1.0 + ds / 1000.0
    // monotone effects (optima at the range edges) — mirroring the paper's
    // important parameters, whose effects are largely monotone, which is why
    // a rank-correlation filter (CPS) can find them
    Map(
      "sens1" -> (5.0 + 60.0 * (1.0 - u1) * (1.0 - u1)) * scale,
      "sens2" -> (5.0 + 40.0 * u2 * u2) * scale,
      "insens" -> 10.0 * scale,
    )
  }

  override def run(conf: ConfigValues, ds: Double, subset: Option[Seq[String]]): ExecResult = {
    runCount += 1
    val ids = subset.getOrElse(queries)
    val exp = expected(conf, ds)
    val times = ids.map(q => q -> exp(q) * math.exp(rng.nextGaussian() * noiseSd)).toMap
    ExecResult(times, gcSeconds = 0.1)
  }
}

object TestObjectives {
  /** A tiny 6-parameter space (2 real knobs + 4 distractors) for fast tests. */
  def smallSpace: ConfigSpace = ConfigSpace(Seq(
    ConfigParam("knob.one", 50, ParamKind.IntK, (0, 100), (0, 100)),
    ConfigParam("knob.two", 0.5, ParamKind.DoubleK, (0, 1), (0, 1)),
    ConfigParam("noise.a", 5, ParamKind.IntK, (0, 10), (0, 10)),
    ConfigParam("noise.b", 0.5, ParamKind.DoubleK, (0, 1), (0, 1)),
    ConfigParam("noise.c", 1.0, ParamKind.BoolK, (0, 1), (0, 1)),
    ConfigParam("noise.d", 100, ParamKind.IntK, (50, 200), (50, 200)),
  ), useRangeA = true)

  def synthetic(seed: Long = 0, noiseSd: Double = 0.01): SyntheticObjective =
    new SyntheticObjective(smallSpace, Seq("knob.one", "knob.two"), noiseSd, seed)
}
