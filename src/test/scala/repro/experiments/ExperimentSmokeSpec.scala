package repro.experiments

import repro.SparkSpec
import repro.data.Datasets

/** Small-scale end-to-end runs of every experiment harness: exercises the
  * exact code the benches use, with shape assertions, at test-friendly
  * sizes.
  */
class ExperimentSmokeSpec extends SparkSpec {

  test("MicroBench measures all applicable schemes on a small dataset") {
    val ds = Datasets.integerDatasets(scaleDiv = 4000, minN = 5000).find(_.name == "linear").get
    val ms = MicroBench.SchemeNames.flatMap(s => MicroBench.measure(ds, s, accessCount = 2000))
    assert(ms.size == MicroBench.SchemeNames.size) // linear is sorted: EF applies
    ms.foreach { m =>
      assert(m.ratio > 0 && m.ratio < 1.5, s"${m.scheme} ratio ${m.ratio}")
      assert(m.accessNs > 0 && m.decompGBps > 0 && m.compGBps > 0)
    }
    // LeCo-fix must compress the clean line much better than FOR
    val byScheme = ms.map(m => m.scheme -> m).toMap
    assert(byScheme("LeCo-fix").ratio < byScheme("FOR").ratio / 2)
  }

  test("MicroBench skips Elias-Fano on unsorted data") {
    val ds = Datasets.integerDatasets(scaleDiv = 4000, minN = 5000).find(_.name == "movieid").get
    assert(MicroBench.measure(ds, "Elias-Fano").isEmpty)
  }

  test("Table 1 aggregation produces one row per scheme") {
    val ds = Datasets.integerDatasets(scaleDiv = 4000, minN = 5000).take(2)
    val ms = for (d <- ds; s <- MicroBench.SchemeNames; m <- MicroBench.measure(d, s, 1000)) yield m
    val t1 = MicroBench.table1(ms)
    assert(t1.map(_._1) == MicroBench.SchemeNames.filterNot(_ == "rANS"))
    assert(t1.forall(_._2 > 0))
  }

  test("StringBench measures every scheme on a small email set") {
    val ms = StringBench.schemes.map(c => StringBench.measure("email", Datasets.emails(1500), c, probes = 500))
    assert(ms.size == 8)
    ms.foreach(m => assert(m.ratio > 0 && m.accessNs > 0))
  }

  test("PartitionerBench fig15: angle never beats var by more than noise") {
    val rows = PartitionerBench.fig15(scaleDiv = 4000)
    assert(rows.size == 9)
    // the paper's claim: LeCo-angle is worse (9%-722%) than LeCo-var overall
    val worse = rows.count(r => r.lecoAngle >= r.lecoVar * 0.99)
    assert(worse >= 5, s"only $worse/9 datasets show angle >= var")
    val avgAngle = rows.map(_.lecoAngle).sum / rows.size
    val avgVar   = rows.map(_.lecoVar).sum / rows.size
    assert(avgAngle > avgVar, s"avg angle $avgAngle !> avg var $avgVar")
  }

  test("PartitionerBench fig16: var is stable across tau, angle swings with eps") {
    val rows = PartitionerBench.fig16(scaleDiv = 4000)
    val varR = rows.filter(_.scheme.startsWith("LeCo-var")).map(_.ratio)
    val angR = rows.filter(_.scheme.startsWith("LeCo-angle")).map(_.ratio)
    assert((varR.max - varR.min) < (angR.max - angR.min),
           s"var swing ${varR.max - varR.min} vs angle swing ${angR.max - angR.min}")
  }

  test("DictBench sweep: LeCo dictionary never loses, dominates at small budgets") {
    val w = DictBench.workload(100_000, 50_000) // raw dict 400KB
    val budgets = Seq(1L << 20, 128L << 10)
    val rs = for (b <- budgets; c <- Seq("Raw", "FOR", "LeCo")) yield DictBench.run(w, c, b)
    assert(rs.map(_.matches).distinct.size == 1, "join results must agree across codecs")
    val at128k = rs.filter(_.budgetBytes == (128L << 10)).map(r => r.codec -> r).toMap
    assert(at128k("LeCo").throughputMBps > at128k("Raw").throughputMBps)
  }

  test("LsmBench sweep runs and LeCo never trails the best baseline by >40%") {
    val dir = java.nio.file.Files.createTempDirectory("lsmsmoke").toFile
    val rs = LsmBench.sweep(dir, nRecords = 10_000, nQueries = 5_000,
                            budgets = Seq(256L << 10, 2L << 20))
    assert(rs.size == 8)
    for (budget <- Seq(256L << 10, 2L << 20)) {
      val at = rs.filter(_.cacheBudget == budget).map(r => r.config -> r.opsPerSec).toMap
      val bestBaseline = Seq("Baseline_1", "Baseline_16", "Baseline_128").map(at).max
      assert(at("LeCo") > bestBaseline * 0.6,
             s"budget $budget: LeCo ${at("LeCo")} vs best $bestBaseline")
    }
  }

  test("ParquetBench filter scan: encodings agree and LeCo file is smallest") {
    val base = java.nio.file.Files.createTempDirectory("pqsmoke").toString
    val dirs = ParquetBench.writeFilterScanTables(spark, base, n = 60_000)
    val (rows, sums) = ParquetBench.filterScan(dirs, Seq(864L))
    assert(sums.values.forall(_.size == 1), "checksum mismatch across encodings")
    val byEnc = rows.map(r => r.encoding -> r.fileMB).toMap
    assert(byEnc("LeCo") < byEnc("Default"))
    ParquetBench.cleanup(base)
  }

  test("ParquetBench bitmap selection returns consistent checksums across encodings") {
    val base = java.nio.file.Files.createTempDirectory("bmsmoke").toString
    val n = 50_000
    val dirs = ParquetBench.writeBitmapTables(spark, base, n)
    val rows = ParquetBench.bitmapSelect(dirs, Seq(0.01), n)
    for ((ds, group) <- rows.groupBy(_.dataset))
      assert(group.map(_.checksum).distinct.size == 1, s"$ds checksums differ")
    ParquetBench.cleanup(base)
  }

  test("MultiColumnBench runs on tiny tables with sane ratios") {
    val rows = MultiColumnBench.run(spark, sf = 0.002)
    assert(rows.size == 9)
    for (r <- rows; (codec, ratio) <- r.ratios) {
      assert(ratio > 0 && ratio < 1.3, s"${r.table}/$codec ratio $ratio")
    }
    // LeCo-fix <= FOR on every table (FOR is a LeCo special case)
    rows.foreach(r => assert(r.ratios("LeCo-fix") <= r.ratios("FOR") * 1.03,
      s"${r.table}: ${r.ratios("LeCo-fix")} vs FOR ${r.ratios("FOR")}"))
  }
}
