package repro.experiments

import java.io.File
import org.apache.spark.sql.SparkSession
import repro.data.Datasets
import repro.lecoformat._

/** §5.1: the Parquet-substrate experiments over the `leco` columnar format.
  *
  * Fig 14 — filter scan: two-column table (almost-sorted `ts` seconds,
  * shuffled `id`s); query `SELECT id WHERE t1 <= ts % 86400 < t2`, window
  * width controls selectivity. Encodings Default / FOR / LeCo-fix.
  *
  * Fig 17 — bitmap selection over single-column files with zipf-clustered
  * bitmaps at varying selectivity.
  *
  * Fig 18/19 — zstd block compression on top of the lightweight encodings:
  * file sizes, and the bitmap-selection time with zstd on.
  */
object ParquetBench {
  val Encodings: Seq[(String, Encoding)] =
    Seq("Default" -> Encoding.Default, "FOR" -> Encoding.For, "LeCo" -> Encoding.LecoFix)

  final case class ScanRow(encoding: String, selectivity: Double, fileMB: Double,
                           millis: Double, rows: Long)
  final case class SizeRow(dataset: String, encoding: String, zstd: Boolean, fileMB: Double)

  /** Build the Fig 14 two-column table and write it in each encoding. */
  def writeFilterScanTables(spark: SparkSession, baseDir: String, n: Int,
                            zstd: Boolean = false): Map[String, String] = {
    import spark.implicits._
    // second-granularity timestamps, near-linear with drifting density (the
    // paper extracts an almost-sorted seconds column from the ml set; our ml
    // analogue is burstier than UCI's, so the wiki-style generator is the
    // closer stand-in — DESIGN.md "Dataset substitutions")
    val rnd = new scala.util.Random(99)
    val ts = Datasets.wiki(n)
    // make it "almost" sorted: small local jitter
    var i = 0
    while (i + 4 < n) { if (rnd.nextInt(10) == 0) { val t = ts(i); ts(i) = ts(i + 1); ts(i + 1) = t }; i += 2 }
    val id = Datasets.facebook(n)
    // shuffle ids (paper: randomly shuffled Facebook user IDs)
    i = n - 1
    while (i > 0) { val j = rnd.nextInt(i + 1); val t = id(i); id(i) = id(j); id(j) = t; i -= 1 }
    val df = spark.sparkContext.parallelize(ts.zip(id).toSeq, 8).toDF("ts", "id")
    Encodings.map { case (name, enc) =>
      val dir = s"$baseDir/fscan_${name}_z$zstd"
      // paper: 10K-item partitions at 200M rows; scaled ~1/100 here so the
      // partition-local delta width stays below the day window and LeCo's
      // computation pruning can fire
      LecoWriter.write(df, dir, enc, partSize = 1024, zstd = zstd, rowGroupRows = 1 << 18)
      name -> dir
    }.toMap
  }

  /** Run the filter-scan query at each selectivity over each encoding.
    * Returns measured rows plus the per-encoding result checksum so callers
    * can assert all encodings agree.
    */
  def filterScan(dirs: Map[String, String], windows: Seq[Long]): (Seq[ScanRow], Map[Double, Set[Long]]) = {
    val results = scala.collection.mutable.ArrayBuffer[ScanRow]()
    val sums = scala.collection.mutable.Map[Double, Set[Long]]()
    for (w <- windows) {
      val pred = TimeOfDayPredicate(86400, 30000, 30000 + w)
      val sel  = w.toDouble / 86400
      var checksums = Set[Long]()
      for ((name, _) <- Encodings) {
        val dir = dirs(name)
        LecoTable.filterScan(dir, "ts", pred, "id") // warm (page cache + JIT)
        LecoTable.filterScan(dir, "ts", pred, "id")
        // best-of-3 wall time (shared JVM; GC noise) + modeled cold-read I/O
        // at 1 GB/s on the chunk bytes actually fetched: the OS page cache
        // makes re-reads free at our 1/100 scale, while the paper's I/O time
        // is proportional to file size (§5.1.1)
        var best = Long.MaxValue
        var out: Array[Long] = null
        var ioBytes = 0L
        for (_ <- 1 to 3) {
          val t0 = System.nanoTime()
          val (o, b) = LecoTable.filterScanCounted(dir, "ts", pred, "id")
          val ns = System.nanoTime() - t0
          if (ns < best) { best = ns; out = o; ioBytes = b }
        }
        val ms = best / 1e6 + ioBytes / 1e9 * 1000.0
        checksums += out.sum + out.length.toLong * 1_000_003
        results += ScanRow(name, sel, LecoTable.totalSizeBytes(dir) / 1048576.0, ms, out.length)
      }
      sums(sel) = checksums
    }
    (results.toSeq, sums.toMap)
  }

  /** Fig 17 datasets written per encoding; returns dataset -> encoding -> dir. */
  def writeBitmapTables(spark: SparkSession, baseDir: String, n: Int,
                        zstd: Boolean = false): Map[String, Map[String, String]] = {
    import spark.implicits._
    val sets = Seq(
      "normal"   -> Datasets.normal(n),
      "poisson"  -> Datasets.poisson(n),
      "booksale" -> Datasets.booksale(n),
      "ml"       -> Datasets.ml(n),
    )
    sets.map { case (dsName, values) =>
      val df = spark.sparkContext.parallelize(values.toSeq, 8).toDF("v")
      dsName -> Encodings.map { case (encName, enc) =>
        val dir = s"$baseDir/bm_${dsName}_${encName}_z$zstd"
        LecoWriter.write(df, dir, enc, partSize = 1024, zstd = zstd, rowGroupRows = 1 << 18)
        encName -> dir
      }.toMap
    }.toMap
  }

  /** Zipf-like clustered bitmap: ten clusters of set bits (§5.1.2). */
  def clusteredBitmap(n: Int, selectivity: Double, seed: Long = 7): Array[Long] = {
    val target = math.max(1, (n * selectivity).toLong)
    val r = new scala.util.Random(seed)
    val clusterSizes = (1 to 10).map(k => target / math.pow(k, 1.2)).map(_.toLong.max(1))
    val positions = scala.collection.mutable.SortedSet[Long]()
    for (size <- clusterSizes) {
      val start = (r.nextDouble() * (n - size - 1)).toLong.max(0)
      var p = start
      while (p < start + size && p < n) { positions += p; p += 1 }
    }
    positions.toArray
  }

  final case class BitmapRow(dataset: String, encoding: String, selectivity: Double,
                             millis: Double, checksum: Long)

  def bitmapSelect(dirs: Map[String, Map[String, String]],
                   selectivities: Seq[Double], n: Int): Seq[BitmapRow] =
    for {
      (dsName, encDirs) <- dirs.toSeq.sortBy(_._1)
      sel <- selectivities
      bitmap = clusteredBitmap(n, sel)
      (encName, dir) <- encDirs.toSeq.sortBy(_._1)
    } yield {
      LecoTable.bitmapSelect(dir, "v", bitmap) // warm
      val t0 = System.nanoTime()
      val out = LecoTable.bitmapSelect(dir, "v", bitmap)
      val ms = (System.nanoTime() - t0) / 1e6
      BitmapRow(dsName, encName, sel, ms, out.sum + out.length)
    }

  /** Fig 18: file sizes with and without zstd for each dataset/encoding. */
  def sizes(dirs: Map[String, Map[String, String]], zstd: Boolean): Seq[SizeRow] =
    for {
      (dsName, encDirs) <- dirs.toSeq.sortBy(_._1)
      (encName, dir) <- encDirs.toSeq.sortBy(_._1)
    } yield SizeRow(dsName, encName, zstd, LecoTable.totalSizeBytes(dir) / 1048576.0)

  def cleanup(baseDir: String): Unit = {
    def rm(f: File): Unit = {
      if (f.isDirectory) f.listFiles().foreach(rm)
      f.delete()
    }
    rm(new File(baseDir))
  }
}
