package repro.experiments

import java.io.File
import repro.lsm._

/** §5.2 (Fig 20): Seek throughput of the mini-LSM with the index block
  * compressed by LeCo vs RocksDB-style restart-interval Delta (RI = 1, 16,
  * 128), across block-cache budgets. Keys are 20 bytes, values 400 bytes;
  * the query keys follow a YCSB-like 80/20 zipf skew.
  */
object LsmBench {

  final case class Result(config: String, cacheBudget: Long, indexBytes: Long,
                          indexRatio: Double, misses: Long, opsPerSec: Double)

  final case class Db(table: SSTable, keys: Array[String], rawIndexBytes: Long)

  def buildDb(dir: File, nRecords: Int, seed: Long = 31): Db = {
    val r = new scala.util.Random(seed)
    val value = new Array[Byte](400)
    r.nextBytes(value)
    // sequential user keys with small gaps, zero-padded to 20 bytes
    var id = 0L
    val keys = Array.fill(nRecords) { id += 1 + r.nextInt(3); f"user$id%016d" }
    val table = SSTable.build(new File(dir, "sst-0.db"), keys.iterator.map(k => (k, value)))
    // "uncompressed" index material: full key + 8B offset + 4B length per block
    val rawIdx = table.separators.map(_.length.toLong + 12).sum
    Db(table, keys, rawIdx)
  }

  def indexFor(db: Db, config: String): IndexBlock = config match {
    case "LeCo"         => new LecoIndex(db.table.separators, db.table.blockHandles)
    case "Baseline_1"   => new RestartIntervalIndex(db.table.separators, db.table.blockHandles, 1)
    case "Baseline_16"  => new RestartIntervalIndex(db.table.separators, db.table.blockHandles, 16)
    case "Baseline_128" => new RestartIntervalIndex(db.table.separators, db.table.blockHandles, 128)
  }

  /** Zipf-ish 80/20 key choice: 80% of seeks hit the hottest 20% of keys. */
  def queryKeys(db: Db, count: Int, seed: Long = 77): Array[String] = {
    val r = new scala.util.Random(seed)
    val n = db.keys.length
    val hot = n / 5
    Array.fill(count) {
      if (r.nextDouble() < 0.8) db.keys((r.nextInt(hot).toLong * 104729 % hot).toInt)
      else db.keys(hot + r.nextInt(n - hot))
    }
  }

  def run(db: Db, config: String, cacheBudget: Long, queries: Array[String]): Result = {
    val index = indexFor(db, config)
    val lsm = new MiniLsm(db.table, index, cacheBudget)
    // warm pass
    queries.foreach(k => require(lsm.seek(k) != null, s"seek miss for $k"))
    // GC fence + best of three measured passes: the bench JVM is shared
    // with Spark-heavy suites and a stray full GC otherwise dominates
    System.gc()
    var totalNs = Long.MaxValue
    var misses = 0L
    var pass = 0
    while (pass < 3) {
      lsm.resetStats()
      val t0 = System.nanoTime()
      var i = 0
      while (i < queries.length) { lsm.seek(queries(i)); i += 1 }
      val cpuNs = System.nanoTime() - t0
      if (cpuNs + lsm.modeledIoNanos < totalNs) { totalNs = cpuNs + lsm.modeledIoNanos; misses = lsm.misses }
      pass += 1
    }
    Result(config, cacheBudget, index.sizeBytes,
           index.sizeBytes.toDouble / db.rawIndexBytes,
           misses, queries.length * 1e9 / totalNs)
  }

  def sweep(dir: File, nRecords: Int = 120_000, nQueries: Int = 100_000,
            budgets: Seq[Long] = Seq(4L, 8L, 16L, 32L).map(_ * 1024 * 1024)): Seq[Result] = {
    val db = buildDb(dir, nRecords)
    val queries = queryKeys(db, nQueries)
    val out = for {
      budget <- budgets
      config <- Seq("LeCo", "Baseline_1", "Baseline_16", "Baseline_128")
    } yield run(db, config, budget, queries)
    db.table.close()
    out
  }

  def format(rs: Seq[Result]): String = {
    val sb = new StringBuilder
    sb ++= f"${"cache(MB)"}%9s ${"config"}%-13s ${"index(KB)"}%10s ${"idx-ratio"}%9s ${"misses"}%9s ${"Kops/s"}%9s\n"
    for (r <- rs)
      sb ++= f"${r.cacheBudget / 1048576.0}%9.0f ${r.config}%-13s ${r.indexBytes / 1024.0}%10.1f ${r.indexRatio * 100}%8.1f%% ${r.misses}%9d ${r.opsPerSec / 1000}%9.1f\n"
    sb.toString
  }
}
