package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.DictBench

/** Fig 11: dictionary-compressed hash-join throughput under shrinking memory
  * budgets (paper: LeCo up to 95.7x over FOR once the FOR dictionary stops
  * fitting; dictionary sizes 5.5MB (LeCo, 0.23%) vs 400MB (FOR, 17%) vs
  * 2.4GB raw at the paper's scale).
  */
class Fig11DictBench extends AnyFunSuite {

  private lazy val results = DictBench.sweep(
    nProbe = 2_000_000, nUnique = 1_000_000,
    budgets = Seq(12L << 20, 8L << 20, 4L << 20, 1L << 20, 256L << 10))

  test("Fig 11 — print measured table") {
    println("==== Fig 11: dict-compressed hash join vs memory budget ====")
    println(DictBench.format(results))
  }

  test("dictionary sizes: LeCo << FOR << Raw (paper: 0.23% / 17% / 100%)") {
    val byCodec = results.groupBy(_.codec).map { case (c, rs) => c -> rs.head.dictBytes }
    println(f"dict sizes: Raw=${byCodec("Raw") / 1048576.0}%.2fMB " +
            f"FOR=${byCodec("FOR") / 1048576.0}%.2fMB LeCo=${byCodec("LeCo") / 1024.0}%.1fKB")
    assert(byCodec("LeCo") * 10 < byCodec("FOR"))
    assert(byCodec("FOR") < byCodec("Raw"))
  }

  test("join result is codec-independent at every budget") {
    for ((b, rs) <- results.groupBy(_.budgetBytes))
      assert(rs.map(_.matches).distinct.size == 1, s"budget $b")
  }

  test("at tight budgets LeCo dominates Raw and FOR") {
    val tight = results.filter(_.budgetBytes <= (1L << 20)).groupBy(_.budgetBytes)
    for ((b, rs) <- tight) {
      val m = rs.map(r => r.codec -> r.throughputMBps).toMap
      assert(m("LeCo") > m("Raw"), s"budget $b: LeCo ${m("LeCo")} !> Raw ${m("Raw")}")
      assert(m("LeCo") >= m("FOR"), s"budget $b: LeCo ${m("LeCo")} !>= FOR ${m("FOR")}")
    }
  }

  test("LeCo speedup over Raw grows as the budget shrinks (paper up to 95.7x)") {
    val speedups = results.groupBy(_.budgetBytes).toSeq.sortBy(-_._1).map { case (b, rs) =>
      val m = rs.map(r => r.codec -> r.throughputMBps).toMap
      (b, m("LeCo") / m("Raw"))
    }
    println("LeCo/Raw speedup by budget: " +
            speedups.map { case (b, s) => f"${b / 1048576.0}%.2fMB:${s}%.1fx" }.mkString(" "))
    assert(speedups.last._2 > speedups.head._2,
           s"speedup should grow as budget shrinks: $speedups")
    assert(speedups.last._2 > 3.0, s"tightest-budget speedup only ${speedups.last._2}")
  }

  test("LeCo dictionary never thrashes (fits at every tested budget)") {
    val leco = results.filter(_.codec == "LeCo")
    leco.foreach(r => assert(r.dictBytes < r.budgetBytes, s"budget ${r.budgetBytes}"))
  }
}
