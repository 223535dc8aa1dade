package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.cluster.Workloads

/** Table 1 — experimented benchmarks and input data sizes. */
class Table1WorkloadsBench extends AnyFunSuite {

  test("Table 1: benchmarks and input data sizes") {
    println("== Table 1: Experimented Benchmarks and Input Data Sizes ==")
    println(f"${"Benchmark"}%-14s ${"#queries"}%9s  input data sizes (GB)")
    Workloads.all.foreach { w =>
      println(f"${w.name}%-14s ${w.profiles.size}%9d  ${Workloads.datasizesGB.map(_.toInt).mkString(", ")}")
    }
    assert(Workloads.all.map(w => w.name -> w.profiles.size) ==
      Seq("TPC-DS" -> 104, "TPC-H" -> 22, "Join" -> 1, "Scan" -> 1, "Aggregation" -> 1))
    assert(Workloads.datasizesGB == Seq(100.0, 200.0, 300.0, 400.0, 500.0))
  }
}
