package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.PartitionerBench

/** Fig 15/16: LeCo-var vs LeCo-angle (angle-based PLA) — overall ratios and
  * hyper-parameter sensitivity. Paper: angle is 9%–722% worse across data
  * sets and swings 0.3→0.6 on books as ε goes 3..13 bits, while var stays
  * stable for τ in [0, 0.2].
  */
class Fig15Fig16PartitionerBench extends AnyFunSuite {

  private lazy val f15 = PartitionerBench.fig15(scaleDiv = 200)
  private lazy val f16 = PartitionerBench.fig16(scaleDiv = 200)

  test("Fig 15 — print measured table") {
    println("==== Fig 15: LeCo-var vs LeCo-angle (scaleDiv=200) ====")
    println(PartitionerBench.format15(f15))
  }

  test("Fig 16 — print hyper-parameter sweep") {
    println("==== Fig 16: eps (angle) and tau (var) sweep on booksale ====")
    println(PartitionerBench.format16(f16))
  }

  test("shape: LeCo-angle trails LeCo-var on most datasets and on average") {
    val worse = f15.count(r => r.lecoAngle >= r.lecoVar * 0.99)
    assert(worse >= 5, s"angle only worse on $worse/9")
    assert(f15.map(_.lecoAngle).sum > f15.map(_.lecoVar).sum)
  }

  test("shape: on at least one dataset angle is even worse than LeCo-fix") {
    assert(f15.exists(r => r.lecoAngle > r.lecoFix), f15.mkString("\n"))
  }

  test("shape: var's tau sweep swings far less than angle's eps sweep") {
    val varR = f16.filter(_.scheme.startsWith("LeCo-var")).map(_.ratio)
    val angR = f16.filter(_.scheme.startsWith("LeCo-angle")).map(_.ratio)
    val varSwing = varR.max - varR.min
    val angSwing = angR.max - angR.min
    println(f"swing: var=$varSwing%.4f angle=$angSwing%.4f")
    assert(varSwing * 2 < angSwing, s"var $varSwing vs angle $angSwing")
  }
}
