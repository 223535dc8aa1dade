package repro.jobs
import repro.baselines._
import repro.cluster._
import repro.core._

/** Quick quality/overhead probe: one cell per workload/ds — compares every
  * tuner's best-config (noise-free) time and optimization hours.
  */
object TimeProbe {
  def main(args: Array[String]): Unit = {
    val cluster = if (args.contains("x86")) ClusterProfile.x86 else ClusterProfile.arm
    val space = ConfigSpace.full(cluster.armRanges)
    val cells = Seq(("TPC-DS", 100.0), ("TPC-DS", 500.0), ("TPC-H", 300.0), ("Join", 500.0), ("Scan", 300.0))
    cells.foreach { case (wn, ds) =>
      val w = Workloads.all.find(_.name == wn).get
      def sim = new SparkClusterSimulator(w, cluster, 42)
      val tuners: Seq[Tuner] = Seq(new Locat(), new Tuneful(), new Dac(), GboRl.forCluster(cluster), new QTuneRl())
      val rows = tuners.map { t =>
        val s = sim
        val r = t.tune(s, space, ds, 42)
        (t.name, r.optimizationSeconds / 3600.0, s.expectedTotal(r.bestConf, ds))
      }
      val (ln, lo, lb) = (rows.head._1, rows.head._2, rows.head._3)
      println(f"== $wn ${ds.toInt}GB ${cluster.name} (LOCAT best=$lb%.0fs opt=$lo%.1fh)")
      rows.tail.foreach { case (n, o, b) =>
        println(f"   $n%-8s best=$b%8.0fs speedup=${b / lb}%5.2fx  opt=$o%7.1fh ratio=${o / lo}%5.1fx")
      }
    }
  }
}
