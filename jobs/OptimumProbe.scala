package repro.jobs
import repro.cluster._
import repro.core._
import scala.util.Random

/** Diagnostic: approximate true optimum via large noise-free random search +
  * coordinate descent, then show where LOCAT's best config deviates.
  */
object OptimumProbe {
  def main(args: Array[String]): Unit = {
    val cluster = ClusterProfile.arm
    val space = ConfigSpace.full(true)
    val ds = args.lift(0).map(_.toDouble).getOrElse(500.0)
    val sim = new SparkClusterSimulator(Workloads.tpcds, cluster, 42)
    val rng = new Random(1)
    var best = space.defaults
    var bestT = sim.expectedTotal(best, ds)
    (1 to 4000).foreach { _ =>
      val c = space.random(rng)
      val t = sim.expectedTotal(c, ds)
      if (t < bestT) { bestT = t; best = c }
    }
    // coordinate descent polish
    (1 to 3).foreach { _ =>
      space.params.foreach { p =>
        val (lo, hi) = space.range(p)
        val cands = (0 to 16).map(i => lo + (hi - lo) * i / 16.0)
        cands.foreach { v =>
          val c = best.updated(p.name, if (p.kind == ParamKind.IntK) math.round(v).toDouble else v)
          val t = sim.expectedTotal(c, ds)
          if (t < bestT) { bestT = t; best = c }
        }
      }
    }
    println(f"oracle optimum @${ds.toInt}GB: $bestT%.0f s")
    println(f"default: ${sim.expectedTotal(space.defaults, ds)}%.0f s")
    val locat = new Locat().tune(sim, space, ds, 42)
    val lt = sim.expectedTotal(locat.bestConf, ds)
    println(f"LOCAT: $lt%.0f s  (${lt / bestT}%.2fx of optimum)")
    println("param                                               oracle     locat")
    space.names.sorted.foreach { n =>
      val o = best(n); val l = locat.bestConf(n)
      val flag = if (math.abs(o - l) > 0.15 * math.max(1.0, math.abs(o))) " <<<" else ""
      println(f"$n%-50s $o%9.1f $l%9.1f$flag")
    }
  }
}
