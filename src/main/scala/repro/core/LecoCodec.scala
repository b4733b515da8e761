package repro.core

import scala.collection.mutable.ArrayBuffer

/** One encoded LeCo partition: linear model + fixed-width biased deltas +
  * the θ1-accumulation error-correction list (§3.3).
  *
  * `corrections` holds the in-partition positions where sequential decode via
  * `pred += θ1` floors differently from direct inference `floor(θ0 + θ1·i)`;
  * at those positions the decoder recomputes directly and resynchronizes.
  */
final case class LecoPartition(theta0: Double, theta1: Double, width: Int,
                               len: Int, words: Array[Long], corrections: Array[Int]) {
  @inline def predict(j: Int): Long = math.floor(theta0 + theta1 * j).toLong
  @inline def get(j: Int): Long = predict(j) + BitPack.read(words, j, width)

  /** Sequential decode with the accumulation optimization (one FP add per
    * value instead of mul+add), writing into `out(outOff ...)`.
    */
  def decodeInto(out: Array[Long], outOff: Int): Unit = {
    var acc  = theta0
    var ci   = 0
    var j    = 0
    while (j < len) {
      var base = math.floor(acc).toLong
      if (ci < corrections.length && corrections(ci) == j) {
        base = predict(j) // resynchronize at a recorded precision slip
        acc  = theta0 + theta1 * j
        ci += 1
      }
      out(outOff + j) = base + BitPack.read(words, j, width)
      acc += theta1
      j += 1
    }
  }

  def payloadBytes: Long = (len.toLong * width + 7) / 8
  def sizeBytes: Long = Codec.LinearHeaderBytes + payloadBytes + corrections.length.toLong * 4
}

object LecoPartition {
  /** Fit + encode one partition of `values(from until until)`. */
  def encode(values: Array[Long], from: Int, until: Int): LecoPartition = {
    val fit   = Regressor.fitLinear(values, from, until)
    val m     = fit.model
    val n     = until - from
    val words = new Array[Long](BitPack.wordsFor(n, fit.bitWidth))
    val corr  = ArrayBuffer[Int]()
    var acc   = m.theta0
    var j = 0
    while (j < n) {
      val direct = m.predict(j)
      if (math.floor(acc).toLong != direct) { corr += j; acc = m.theta0 + m.theta1 * j }
      BitPack.write(words, j.toLong * fit.bitWidth, fit.bitWidth, values(from + j) - direct)
      acc += m.theta1
      j += 1
    }
    LecoPartition(m.theta0, m.theta1, fit.bitWidth, n, words, corr.toArray)
  }
}

/** LeCo with fixed-length partitions (LeCo-fix, §3.2.1).
  *
  * `partitionSize = 0` triggers the sampling-based size search. Random access
  * locates the partition by division — no metadata search.
  */
final class LecoFixCodec(val partitionSize: Int = 0) extends IntCodec {
  val name = "LeCo-fix"

  def compress(values: Array[Long]): LecoFixCompressed = {
    val size =
      if (partitionSize > 0) partitionSize
      else Partitioner.searchFixedSize(values, (s, l) => LecoFixCodec.costAt(s, l))
    val n = values.length
    val parts = new Array[LecoPartition](((n + size - 1) / size).max(1))
    var p = 0
    var s = 0
    while (s < n) { parts(p) = LecoPartition.encode(values, s, math.min(s + size, n)); p += 1; s += size }
    new LecoFixCompressed(n, size, parts)
  }
}

object LecoFixCodec {
  /** Compressed bytes of `sample` at partition size `l` — the search cost fn. */
  def costAt(sample: Array[Long], l: Int): Long = {
    var total = 0L
    var s = 0
    while (s < sample.length) {
      val e   = math.min(s + l, sample.length)
      val fit = Regressor.fitLinear(sample, s, e)
      total += Codec.LinearHeaderBytes + ((e - s).toLong * fit.bitWidth + 7) / 8
      s = e
    }
    total
  }
}

final class LecoFixCompressed(val n: Int, val partSize: Int,
                              val parts: Array[LecoPartition]) extends CompressedInts {
  def length: Int = n
  def sizeBytes: Long = parts.iterator.map(_.sizeBytes).sum
  override def modelBytes: Long = parts.length.toLong * Codec.LinearHeaderBytes
  def get(i: Int): Long = { val p = parts(i / partSize); p.get(i % partSize) }
  def decompressAll(): Array[Long] = {
    val out = new Array[Long](n)
    var off = 0
    var k = 0
    while (k < parts.length) { parts(k).decodeInto(out, off); off += parts(k).len; k += 1 }
    out
  }
}

/** LeCo with variable-length partitions (LeCo-var, §3.2.2): greedy
  * split/merge boundaries; random access binary-searches the partition start
  * index (the paper uses ALEX for this lower-bound search; a branchless
  * binary search stands in — same asymptotics, §4.3.2's extra ~35–90 ns).
  */
final class LecoVarCodec(val tau: Double = 0.1) extends IntCodec {
  val name = "LeCo-var"

  def compress(values: Array[Long]): LecoVarCompressed = {
    val ps = Partitioner.variable(values, Partitioner.LinearMode, tau)
    val parts = new Array[LecoPartition](ps.count)
    var k = 0
    while (k < ps.count) { parts(k) = LecoPartition.encode(values, ps.starts(k), ps.end(k)); k += 1 }
    new LecoVarCompressed(values.length, ps.starts, parts)
  }
}

final class LecoVarCompressed(val n: Int, val starts: Array[Int],
                              val parts: Array[LecoPartition]) extends CompressedInts {
  def length: Int = n
  def sizeBytes: Long = parts.iterator.map(_.sizeBytes).sum
  override def modelBytes: Long = parts.length.toLong * Codec.LinearHeaderBytes

  /** Lower-bound search: largest k with starts(k) <= i. */
  @inline def partitionOf(i: Int): Int = {
    var lo = 0; var hi = starts.length - 1
    while (lo < hi) {
      val mid = (lo + hi + 1) >>> 1
      if (starts(mid) <= i) lo = mid else hi = mid - 1
    }
    lo
  }

  def get(i: Int): Long = { val k = partitionOf(i); parts(k).get(i - starts(k)) }

  def decompressAll(): Array[Long] = {
    val out = new Array[Long](n)
    var k = 0
    while (k < parts.length) { parts(k).decodeInto(out, starts(k)); k += 1 }
    out
  }
}
