package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.LsmBench

/** Fig 20: Seek throughput of the RocksDB substrate with LeCo-compressed
  * index blocks vs restart-interval baselines, across block-cache budgets.
  * Paper: index ratios LeCo 28.1%, RI1 71.3%, RI16 18.9%, RI128 15.9%;
  * LeCo up to +16% throughput over the best baseline, advantage largest at
  * small cache sizes.
  */
class Fig20LsmBench extends AnyFunSuite {

  private lazy val results = {
    val dir = java.nio.file.Files.createTempDirectory("fig20b").toFile
    LsmBench.sweep(dir, nRecords = 120_000, nQueries = 100_000,
                   budgets = Seq(4L << 20, 8L << 20, 16L << 20, 32L << 20))
  }

  test("Fig 20 — print measured table") {
    println("==== Fig 20: mini-LSM Seek throughput (120K x 420B records ~ 50MB) ====")
    println("paper index ratios: LeCo 28.1% | RI1 71.3% | RI16 18.9% | RI128 15.9%")
    println(LsmBench.format(results))
  }

  test("index size ratios have the paper's ordering: RI128 < RI16 ~ LeCo << RI1") {
    val m = results.groupBy(_.config).map { case (c, rs) => c -> rs.head.indexRatio }
    assert(m("Baseline_128") < m("Baseline_16"))
    assert(m("Baseline_16") < m("Baseline_1"))
    assert(m("LeCo") < m("Baseline_1") / 1.5, s"LeCo ${m("LeCo")} vs RI1 ${m("Baseline_1")}")
  }

  test("shape: LeCo beats Baseline_1 at small cache budgets (index leaves room for data)") {
    val small = results.filter(_.cacheBudget == (4L << 20)).map(r => r.config -> r.opsPerSec).toMap
    assert(small("LeCo") > small("Baseline_1"),
           s"LeCo ${small("LeCo")} !> Baseline_1 ${small("Baseline_1")}")
  }

  test("shape: LeCo beats the RI-compressed baselines (cheap random access)") {
    for (budget <- results.map(_.cacheBudget).distinct) {
      val m = results.filter(_.cacheBudget == budget).map(r => r.config -> r.opsPerSec).toMap
      assert(m("LeCo") > math.min(m("Baseline_16"), m("Baseline_128")) * 0.95,
             s"budget $budget: ${m.toSeq.sortBy(_._1)}")
    }
  }

  test("shape: LeCo is the best or near-best config overall") {
    val perBudget = results.groupBy(_.cacheBudget).map { case (b, rs) =>
      val best = rs.maxBy(_.opsPerSec)
      val leco = rs.find(_.config == "LeCo").get
      (b, leco.opsPerSec / best.opsPerSec)
    }
    println("LeCo vs best-of-all per budget: " +
            perBudget.toSeq.sortBy(_._1).map { case (b, f) => f"${b >> 20}MB:${f}%.2f" }.mkString(" "))
    assert(perBudget.values.forall(_ > 0.85), perBudget.toString)
  }

  test("misses shrink as the cache budget grows, for every config") {
    for (config <- results.map(_.config).distinct) {
      val byBudget = results.filter(_.config == config).sortBy(_.cacheBudget).map(_.misses)
      assert(byBudget.zip(byBudget.tail).forall { case (a, b) => b <= a }, s"$config: $byBudget")
    }
  }
}
