package repro.jobs

import repro.cluster.{ClusterProfile, SparkClusterSimulator, Workloads}
import repro.core.{ConfigSpace, Iicp}
import repro.stats.Stats
import scala.util.Random

/** Calibration utility: prints per-parameter SCC rankings of the simulator at
  * several datasizes (large sample count, so sampling noise is negligible),
  * plus CV structure and time magnitudes. Used to tune the simulator's
  * coefficients against the paper's Table 3 / Fig 8 anchors.
  */
object CalibrationProbe {
  def main(args: Array[String]): Unit = {
    val n = args.lift(0).map(_.toInt).getOrElse(200)
    val cluster = ClusterProfile.arm
    val space = ConfigSpace.full(cluster.armRanges)
    val sim = new SparkClusterSimulator(Workloads.tpcds, cluster, 7)
    val rng = new Random(7)

    Seq(100.0, 500.0, 1000.0).foreach { ds =>
      val samples = (1 to n).map { _ =>
        val c = space.random(rng)
        (c, sim.expectedTotal(c, ds))
      }
      val ranked = Iicp.cps(space, samples, threshold = 0.0).take(10)
      println(s"=== ds=${ds.toInt}GB  total time range: ${samples.map(_._2).min.toInt}s .. ${samples.map(_._2).max.toInt}s")
      ranked.foreach { case (p, s) => println(f"  $p%-55s SCC=$s%+.3f") }
    }

    // CV structure at 100GB
    val confs = (1 to 40).map(_ => space.random(rng))
    val perQ = confs.map(c => sim.expectedPerQuery(c, 100.0))
    val cvs = Workloads.tpcds.queryIds.map(q => q -> Stats.cv(perQ.map(_(q)))).toMap
    val sorted = cvs.toSeq.sortBy(-_._2)
    println(s"=== CV: max=${sorted.head} min=${sorted.last}")
    println(s"  Q72=${cvs("Q72")} Q04=${cvs("Q04")} Q09=${cvs("Q09")} Q08=${cvs("Q08")}")
    val thr = cvs.values.min + (cvs.values.max - cvs.values.min) / 3
    val kept = Workloads.tpcds.queryIds.filter(q => cvs(q) >= thr)
    println(s"  threshold=$thr kept=${kept.size}: ${kept.mkString(",")}")
    val paperSet = Workloads.tpcdsCsq.toSet
    println(s"  overlap with paper's 23: ${kept.count(paperSet)} missing=${paperSet.diff(kept.toSet)}")
    // time split
    val good = confs.minBy(c => sim.expectedTotal(c, 100.0))
    val t = sim.expectedPerQuery(good, 100.0)
    val csqT = Workloads.tpcdsCsq.map(t).sum
    println(f"  best-sampled conf: total=${t.values.sum}%.0fs csq=${csqT}%.0fs share=${csqT / t.values.sum}%.2f")
    val tr = sim.expectedPerQuery(confs.head, 100.0)
    val csqTr = Workloads.tpcdsCsq.map(tr).sum
    println(f"  random conf:       total=${tr.values.sum}%.0fs csq=${csqTr}%.0fs share=${csqTr / tr.values.sum}%.2f")
  }
}
