package repro.jobs

import repro.cluster.{ClusterProfile, SparkClusterSimulator, Workloads}
import repro.core.{ConfigSpace, Iicp}
import scala.util.Random

/** spark-submit entrypoint: Table 3 — top-5 CPS-selected parameters for
  * TPC-DS at 100 GB, 500 GB, and 1 TB.
  */
object RunTable3 {
  def main(args: Array[String]): Unit = {
    val seed = args.lift(0).map(_.toLong).getOrElse(7L)
    val cluster = ClusterProfile.arm
    val space = ConfigSpace.full(cluster.armRanges)
    val sim = new SparkClusterSimulator(Workloads.tpcds, cluster, seed)
    val rng = new Random(seed)
    Seq(100.0, 500.0, 1000.0).foreach { ds =>
      val samples = (1 to 20).map { _ =>
        val conf = space.random(rng)
        (conf, sim.run(conf, ds).totalSeconds)
      }
      val top5 = Iicp.cps(space, samples).take(5)
      println(s"Top-5 important parameters @ ${ds.toInt} GB:")
      top5.foreach { case (p, scc) => println(f"  $p%-55s SCC=$scc%+.3f") }
    }
  }
}
