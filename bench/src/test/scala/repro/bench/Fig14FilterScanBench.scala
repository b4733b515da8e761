package repro.bench

import repro.SparkSpec
import repro.experiments.ParquetBench

/** Fig 14: filter-scan over the columnar-format substrate — predicate on an
  * almost-sorted ts column (t1 <= ts % 86400 < t2), late-materialized
  * projection of a shuffled id column. Paper: LeCo 3.7x over Default and
  * 1.4x over FOR on average; file sizes 3.0 / 1.3 / 1.1 GB.
  */
class Fig14FilterScanBench extends SparkSpec {

  private lazy val base = java.nio.file.Files.createTempDirectory("fig14b").toString
  private lazy val dirs = ParquetBench.writeFilterScanTables(spark, base, n = 2_000_000)
  private lazy val (rows, sums) = ParquetBench.filterScan(dirs, Seq(86L, 864L, 8640L))

  test("Fig 14 — print measured table") {
    println("==== Fig 14: filter scan, 2M rows (paper 200M) ====")
    println(f"${"encoding"}%-8s ${"select."}%8s ${"file(MB)"}%9s ${"time(ms)"}%9s ${"rows"}%9s")
    rows.foreach(r => println(f"${r.encoding}%-8s ${r.selectivity}%8.4f ${r.fileMB}%9.1f ${r.millis}%9.1f ${r.rows}%9d"))
  }

  test("query results identical across encodings at every selectivity") {
    sums.foreach { case (sel, cs) => assert(cs.size == 1, s"selectivity $sel") }
  }

  test("file sizes: LeCo < FOR < Default (paper 1.1 / 1.3 / 3.0 GB)") {
    val m = rows.groupBy(_.encoding).map { case (e, rs) => e -> rs.head.fileMB }
    println(f"files: Default=${m("Default")}%.1fMB FOR=${m("FOR")}%.1fMB LeCo=${m("LeCo")}%.1fMB")
    assert(m("LeCo") < m("FOR") && m("FOR") < m("Default"))
  }

  test("shape: LeCo faster than Default at every selectivity") {
    for (sel <- rows.map(_.selectivity).distinct) {
      val m = rows.filter(_.selectivity == sel).map(r => r.encoding -> r.millis).toMap
      assert(m("LeCo") < m("Default"), s"sel $sel: LeCo ${m("LeCo")} !< Default ${m("Default")}")
    }
  }

  test("shape: LeCo beats FOR on average (computation pruning)") {
    val avg = (e: String) => { val r = rows.filter(_.encoding == e); r.map(_.millis).sum / r.size }
    println(f"avg time: Default=${avg("Default")}%.1fms FOR=${avg("FOR")}%.1fms LeCo=${avg("LeCo")}%.1fms " +
            f"(speedups: ${avg("Default") / avg("LeCo")}%.1fx over Default, ${avg("FOR") / avg("LeCo")}%.2fx over FOR)")
    assert(avg("LeCo") < avg("FOR"), s"LeCo ${avg("LeCo")} !< FOR ${avg("FOR")}")
  }
}
