package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments._

/** spark-submit entrypoints, one per reproduced table/figure. Non-Spark
  * experiments (the paper's single-threaded microbenchmarks) still expose a
  * job for uniformity; Spark-backed ones build a local session.
  */
object JobUtil {
  def session(name: String): SparkSession =
    SparkSession.builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** Fig 10 rows 1–3 + Table 1: integer microbenchmark. */
object MicroBenchJob {
  def main(args: Array[String]): Unit = {
    val scaleDiv = args.headOption.map(_.toInt).getOrElse(200)
    val ms = MicroBench.run(scaleDiv)
    println(MicroBench.format(ms))
    println("Table 1 — compression throughput (GB/s), weighted average:")
    MicroBench.table1(ms).foreach { case (s, t) => println(f"  $s%-11s $t%8.3f") }
  }
}

/** Fig 11: dictionary-compressed hash join under memory budgets. */
object DictBenchJob {
  def main(args: Array[String]): Unit =
    println(DictBench.format(DictBench.sweep()))
}

/** Fig 12: multi-column table compression (runs on Spark executors). */
object MultiColumnJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig12")
    val sf = args.headOption.map(_.toDouble).getOrElse(0.02)
    println(MultiColumnBench.format(MultiColumnBench.run(spark, sf)))
    println("High-cardinality subset (NDV > 10%):")
    println(MultiColumnBench.format(MultiColumnBench.highCardinality(spark, sf)))
    spark.stop()
  }
}

/** Fig 13: string compression (LeCo string extension vs FSST). */
object StringBenchJob {
  def main(args: Array[String]): Unit =
    println(StringBench.format(StringBench.run()))
}

/** Fig 15/16: variable-length partitioner vs angle-based PLA. */
object PartitionerJob {
  def main(args: Array[String]): Unit = {
    println(PartitionerBench.format15(PartitionerBench.fig15()))
    println(PartitionerBench.format16(PartitionerBench.fig16()))
  }
}

/** Fig 14: Parquet-substrate filter scan. */
object FilterScanJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig14")
    val base = java.nio.file.Files.createTempDirectory("fig14").toString
    val n = args.headOption.map(_.toInt).getOrElse(2_000_000)
    val dirs = ParquetBench.writeFilterScanTables(spark, base, n)
    val (rows, _) = ParquetBench.filterScan(dirs, Seq(86L, 864L, 8640L))
    rows.foreach(r => println(f"${r.encoding}%-8s sel=${r.selectivity}%7.4f file=${r.fileMB}%8.1fMB time=${r.millis}%9.1fms rows=${r.rows}"))
    ParquetBench.cleanup(base)
    spark.stop()
  }
}

/** Fig 17/18/19: bitmap selection + zstd interplay. */
object BitmapJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig17")
    val base = java.nio.file.Files.createTempDirectory("fig17").toString
    val n = args.headOption.map(_.toInt).getOrElse(1_000_000)
    val dirs = ParquetBench.writeBitmapTables(spark, base, n)
    ParquetBench.bitmapSelect(dirs, Seq(0.0001, 0.001, 0.01, 0.1), n)
      .foreach(r => println(f"${r.dataset}%-9s ${r.encoding}%-8s sel=${r.selectivity}%7.4f time=${r.millis}%9.2fms"))
    val zdirs = ParquetBench.writeBitmapTables(spark, base, n, zstd = true)
    println("file sizes (MB), zstd off/on:")
    (ParquetBench.sizes(dirs, zstd = false) ++ ParquetBench.sizes(zdirs, zstd = true))
      .foreach(r => println(f"${r.dataset}%-9s ${r.encoding}%-8s zstd=${r.zstd}%-5s ${r.fileMB}%8.2fMB"))
    ParquetBench.cleanup(base)
    spark.stop()
  }
}

/** Fig 20: RocksDB-substrate Seek throughput vs block-cache size. */
object LsmJob {
  def main(args: Array[String]): Unit = {
    val dir = java.nio.file.Files.createTempDirectory("fig20").toFile
    println(LsmBench.format(LsmBench.sweep(dir)))
  }
}
