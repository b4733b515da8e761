package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.MicroBench

/** Fig 10 (rows 1–3): compression ratio, random-access latency and full
  * decompression throughput of the seven schemes on the nine integer data
  * sets, at 1/200 of the paper's sizes. Prints paper-style rows and asserts
  * the qualitative shape (LeCo's Pareto claims).
  */
class Fig10MicroBench extends AnyFunSuite {

  private lazy val ms = MicroBench.run(scaleDiv = 200)

  test("Fig 10 — print measured table") {
    println("==== Fig 10: integer microbenchmark (scaleDiv=200) ====")
    println(MicroBench.format(ms))
  }

  test("Fig 10 shape: LeCo-fix ratio beats FOR on nearly every dataset") {
    val byDs = ms.groupBy(_.dataset)
    var strictWins = 0
    for ((ds, rows) <- byDs) {
      val m = rows.map(r => r.scheme -> r.ratio).toMap
      if (m("LeCo-fix") < m("FOR")) strictWins += 1
      // run-dominated sets (house_price) can tie: both widths ~0, LeCo pays
      // its larger header (2 doubles vs 1 long) — bounded at 15%
      assert(m("LeCo-fix") < m("FOR") * 1.15, s"$ds: LeCo-fix ${m("LeCo-fix")} vs FOR ${m("FOR")}")
    }
    assert(strictWins >= 7, s"LeCo-fix only strictly better on $strictWins/9")
  }

  test("Fig 10 shape: rANS is the worst compressor on the synthetic sorted sets") {
    for (ds <- Seq("linear", "normal")) {
      val rows = ms.filter(_.dataset == ds).map(r => r.scheme -> r.ratio).toMap
      assert(rows("rANS") > rows("LeCo-fix") && rows("rANS") > rows("FOR"), ds)
    }
  }

  test("Fig 10 shape: LeCo-fix random access within ~4x of FOR") {
    val ratio = for (ds <- ms.map(_.dataset).distinct) yield {
      val rows = ms.filter(_.dataset == ds).map(r => r.scheme -> r.accessNs).toMap
      rows("LeCo-fix") / rows("FOR")
    }
    val avg = ratio.sum / ratio.size
    assert(avg < 4.0, s"avg LeCo-fix/FOR access ratio $avg")
  }

  test("Fig 10 shape: Delta variants are an order of magnitude slower in random access") {
    val avgOf = (s: String) => {
      val rows = ms.filter(_.scheme == s)
      rows.map(_.accessNs).sum / rows.size
    }
    assert(avgOf("Delta-fix") > 5 * avgOf("LeCo-fix"),
           s"Delta-fix ${avgOf("Delta-fix")} vs LeCo-fix ${avgOf("LeCo-fix")}")
  }

  test("Fig 10 shape: LeCo variants compress better than FOR on smooth sets") {
    val rows = ms.filter(_.dataset == "linear").map(r => r.scheme -> r.ratio).toMap
    assert(rows("LeCo-fix") < rows("FOR") * 0.5,
           s"linear: ${rows("LeCo-fix")} vs FOR ${rows("FOR")}")
    for (ds <- Seq("normal", "poisson")) {
      val m = ms.filter(_.dataset == ds).map(r => r.scheme -> r.ratio).toMap
      // our sorted-sample analogues are noisier than the paper's: require a
      // clear (>=10%) win rather than the paper's 2x
      assert(m("LeCo-fix") < m("FOR") * 0.9, s"$ds: ${m("LeCo-fix")} vs FOR ${m("FOR")}")
    }
  }

  test("Fig 10 shape: LeCo-var never worse than LeCo-fix on movieid/house_price") {
    for (ds <- Seq("movieid", "house_price")) {
      val rows = ms.filter(_.dataset == ds).map(r => r.scheme -> r.ratio).toMap
      assert(rows("LeCo-var") <= rows("LeCo-fix") * 1.05, s"$ds")
    }
  }

  test("Table 1 — compression throughput (GB/s), weighted average") {
    println("==== Table 1: compression throughput (GB/s) ====")
    println("paper:    FOR 0.81±0.28 | Elias-Fano 0.58±0.17 | Delta-fix 1.04±0.14 | " +
            "Delta-var 0.04±0.01 | LeCo-fix 0.78±0.11 | LeCo-var 0.02±0.01")
    val t1 = MicroBench.table1(ms).toMap
    println("measured: " + MicroBench.table1(ms).map { case (s, v) => f"$s $v%.3f" }.mkString(" | "))
    // shape: variable-length partitioning costs compression throughput.
    // (Our split/merge keeps O(1) combinable aggregates, so the gap is
    // smaller than the paper's re-fitting implementation — see EXPERIMENTS.)
    assert(t1("LeCo-var") < t1("LeCo-fix"))
    assert(t1("Delta-var") < t1("Delta-fix"))
    // fixed-partition schemes are the same order of magnitude as each other
    assert(t1("LeCo-fix") > t1("FOR") / 10 && t1("LeCo-fix") < t1("FOR") * 10)
  }
}
