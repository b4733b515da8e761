package repro.bench

import repro.SparkSpec
import repro.experiments.ParquetBench

/** Fig 17/18/19: bitmap selection over the columnar substrate and the zstd
  * interplay. Paper: LeCo up to 12.6x over Default and 5.6x over FOR at low
  * selectivity; zstd shrinks every file further (LeCo+zstd smallest) but its
  * decode CPU cost makes the bitmap query *slower* (Fig 19).
  */
class Fig17BitmapBench extends SparkSpec {

  private val n = 1_000_000
  private lazy val base  = java.nio.file.Files.createTempDirectory("fig17b").toString
  private lazy val dirs  = ParquetBench.writeBitmapTables(spark, base, n)
  private lazy val zdirs = ParquetBench.writeBitmapTables(spark, base, n, zstd = true)
  private lazy val rows  = ParquetBench.bitmapSelect(dirs, Seq(0.0001, 0.001, 0.01, 0.1), n)

  test("Fig 17 — print measured table") {
    println("==== Fig 17: bitmap selection, 1M rows/dataset (paper 200M) ====")
    println(f"${"dataset"}%-9s ${"encoding"}%-8s ${"select."}%8s ${"time(ms)"}%9s")
    rows.foreach(r => println(f"${r.dataset}%-9s ${r.encoding}%-8s ${r.selectivity}%8.4f ${r.millis}%9.2f"))
  }

  test("results agree across encodings per dataset+selectivity") {
    for (((ds, sel), group) <- rows.groupBy(r => (r.dataset, r.selectivity)))
      assert(group.map(_.checksum).distinct.size == 1, s"$ds@$sel")
  }

  test("shape: LeCo at least ties FOR and Default at low selectivity") {
    for (ds <- Seq("normal", "poisson", "booksale", "ml"); sel <- Seq(0.0001, 0.001)) {
      val m = rows.filter(r => r.dataset == ds && r.selectivity == sel)
        .map(r => r.encoding -> r.millis).toMap
      assert(m("LeCo") <= m("Default") * 1.2, s"$ds@$sel LeCo ${m("LeCo")} vs Default ${m("Default")}")
    }
  }

  test("Fig 18 — zstd on top of lightweight encodings: print sizes, LeCo+zstd smallest") {
    val plain = ParquetBench.sizes(dirs, zstd = false)
    val z     = ParquetBench.sizes(zdirs, zstd = true)
    println("==== Fig 18: file sizes (MB), zstd off/on ====")
    (plain ++ z).foreach(r => println(f"${r.dataset}%-9s ${r.encoding}%-8s zstd=${r.zstd}%-5s ${r.fileMB}%8.2f"))
    for (ds <- Seq("normal", "poisson", "booksale", "ml")) {
      val zOf = (e: String) => z.find(r => r.dataset == ds && r.encoding == e).get.fileMB
      val pOf = (e: String) => plain.find(r => r.dataset == ds && r.encoding == e).get.fileMB
      assert(zOf("LeCo") <= pOf("LeCo") * 1.01, s"$ds: zstd grew the LeCo file")
      assert(zOf("LeCo") <= zOf("Default"), s"$ds: LeCo+zstd not smallest")
    }
  }

  test("Fig 19 — zstd decode overhead makes the ml bitmap query slower") {
    val sel = 0.01
    val mlPlain = ParquetBench.bitmapSelect(Map("ml" -> dirs("ml")), Seq(sel), n)
    val mlZ     = ParquetBench.bitmapSelect(Map("ml" -> zdirs("ml")), Seq(sel), n)
    println("==== Fig 19: ml @ sel=0.01, zstd off vs on (ms) ====")
    for (enc <- Seq("Default", "FOR", "LeCo")) {
      val p = mlPlain.find(_.encoding == enc).get.millis
      val q = mlZ.find(_.encoding == enc).get.millis
      println(f"$enc%-8s plain=$p%8.2f zstd=$q%8.2f (${q / p}%.2fx)")
    }
    val pl = mlPlain.map(_.millis).sum
    val zz = mlZ.map(_.millis).sum
    assert(zz > pl, s"zstd total $zz should exceed plain $pl (CPU-bound decode)")
  }
}
