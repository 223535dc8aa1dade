package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{ConfigParam, ParamKind}

/** Table 2 — the 38 tuned parameters with defaults and Range A/B. */
class Table2ParamsBench extends AnyFunSuite {

  test("Table 2: selected parameters, defaults, and ranges") {
    println("== Table 2: Description of Selected Parameters ==")
    println(f"${"parameter"}%-58s ${"default"}%9s ${"Range A (ARM)"}%15s ${"Range B (x86)"}%15s")
    ConfigParam.all.foreach { p =>
      def fmt(r: (Double, Double)) = p.kind match {
        case ParamKind.BoolK => "true,false"
        case _ => s"${if (r._1 == r._1.toLong) r._1.toLong else r._1} - ${if (r._2 == r._2.toLong) r._2.toLong else r._2}"
      }
      val d = if (p.default < 0) "#" else if (p.default == p.default.toLong) p.default.toLong.toString else p.default.toString
      val star = if (p.resource) "*" else " "
      println(f"$star${p.name}%-57s $d%9s ${fmt(p.rangeA)}%15s ${fmt(p.rangeB)}%15s")
    }
    assert(ConfigParam.all.size == 38)
    assert(ConfigParam.all.count(_.isBool) == 11)
    assert(ConfigParam.all.count(_.resource) == 6)
  }
}
