package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.cluster.ClusterProfile

/** Fig 21 / §5.10 — grafting QCSA and IICP onto the SOTA tuners
  * (TPC-DS, 500 GB). Paper: IICP alone improves tuned performance ~1.7× and
  * cuts overhead ~1.2×; QCSA alone cuts overhead ~4.2×; both together
  * improve performance ~2.6× and cut overhead ~6.8×.
  */
class Fig21QcsaIicpOnSotaBench extends AnyFunSuite {

  test("Fig 21: QCSA/IICP grafted onto the SOTA tuners cut overhead and keep quality") {
    val c = ClusterProfile.arm
    val ds = 500.0
    println("== Fig 21: APT vs +QCSA vs +IICP vs +QCSA+IICP (TPC-DS, 500 GB, ARM) ==")
    val variants = Seq("", "+QCSA", "+IICP", "+QCSA+IICP")
    val rows = Bench.sotaNames.map { base =>
      val cells = variants.map {
        case "" => "APT" -> Bench.run(base, "TPC-DS", c, ds)
        case v => v -> Bench.run(base + v, "TPC-DS", c, ds)
      }
      val apt = cells.head._2
      println(f"$base%-8s " + cells.map { case (v, cell) =>
        f"$v: opt=${cell.optHours}%6.1fh best=${cell.cleanTime}%7.0fs"
      }.mkString(" | "))
      println(f"         overhead reduction vs APT: " + cells.tail.map { case (v, cell) =>
        f"$v=${apt.result.optimizationSeconds / cell.result.optimizationSeconds}%4.2fx"
      }.mkString(" "))
      base -> cells.toMap
    }.toMap

    // shape assertions (per the paper's §5.10 directions of effect):
    rows.foreach { case (base, cells) =>
      val apt = cells("APT"); val qcsa = cells("+QCSA"); val both = cells("+QCSA+IICP")
      assert(qcsa.result.optimizationSeconds < apt.result.optimizationSeconds,
        s"$base: QCSA did not reduce overhead")
      assert(both.result.optimizationSeconds < apt.result.optimizationSeconds,
        s"$base: QCSA+IICP did not reduce overhead")
      // quality must not collapse: grafted variants stay within 40% of APT
      assert(both.cleanTime < apt.cleanTime * 1.4, s"$base: grafts degraded quality too much")
    }
    // QCSA is the bigger overhead lever in aggregate (paper: 4.2x vs 1.2x) —
    // per-baseline this can flip at 500 GB, where the kept CSQs carry most of
    // the runtime and the RQA saving is structurally smaller
    val aggQcsa = rows.values.map(_("+QCSA").result.optimizationSeconds).sum
    val aggIicp = rows.values.map(_("+IICP").result.optimizationSeconds).sum
    assert(aggQcsa < aggIicp, s"aggregate: QCSA $aggQcsa vs IICP $aggIicp")
  }
}
