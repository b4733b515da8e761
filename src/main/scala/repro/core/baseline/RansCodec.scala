package repro.core.baseline

import repro.core._

/** Order-0 byte-wise static rANS (asymmetric numeral systems, Duda 2013) —
  * the entropy-coding baseline of §4.1. Values are serialized little-endian
  * at `bytesPerValue` bytes, a global frequency table (normalized to 2^12)
  * is trained over the whole stream, and the stream is encoded in blocks of
  * `blockValues` values so "random access" decodes only a block prefix.
  */
final class RansCodec(val bytesPerValue: Int = 8, val blockValues: Int = 16384) extends IntCodec {
  val name = "rANS"

  def compress(values: Array[Long]): RansCompressed = {
    val n = values.length
    // Global byte frequency table over the serialized stream.
    val counts = new Array[Long](256)
    var i = 0
    while (i < n) {
      var b = 0
      while (b < bytesPerValue) { counts(((values(i) >>> (8 * b)) & 0xff).toInt) += 1; b += 1 }
      i += 1
    }
    val freq = Rans.normalize(counts, n.toLong * bytesPerValue)
    val cum  = new Array[Int](257)
    i = 0
    while (i < 256) { cum(i + 1) = cum(i) + freq(i); i += 1 }

    val blocks = new Array[Array[Byte]](math.max(1, (n + blockValues - 1) / blockValues))
    var blk = 0
    var s   = 0
    while (s < n) {
      val e = math.min(s + blockValues, n)
      blocks(blk) = Rans.encodeBlock(values, s, e, bytesPerValue, freq, cum)
      blk += 1; s = e
    }
    new RansCompressed(n, bytesPerValue, blockValues, freq, cum, blocks)
  }
}

/** Minimal rANS with 8-bit renormalization (ryg-style), PROB_BITS = 12. */
object Rans {
  val ProbBits  = 12
  val ProbScale = 1 << ProbBits
  val Low       = 1L << 23

  /** Scale raw counts to sum exactly `ProbScale`, keeping every present
    * symbol's frequency >= 1.
    */
  def normalize(counts: Array[Long], total: Long): Array[Int] = {
    val freq = new Array[Int](256)
    if (total == 0) return freq
    var assigned = 0
    var i = 0
    while (i < 256) {
      if (counts(i) > 0) {
        freq(i) = math.max(1L, counts(i) * ProbScale / total).toInt
        assigned += freq(i)
      }
      i += 1
    }
    // Fix the rounding drift on the most frequent symbol.
    var maxI = 0
    i = 1
    while (i < 256) { if (counts(i) > counts(maxI)) maxI = i; i += 1 }
    freq(maxI) += ProbScale - assigned
    require(freq(maxI) >= 1, "frequency normalization failed (too many rare symbols)")
    freq
  }

  /** Encode bytes of `values(from until until)` in reverse so the decoder
    * reads forward; renorm bytes plus the 4-byte final state are returned.
    */
  def encodeBlock(values: Array[Long], from: Int, until: Int, bpv: Int,
                  freq: Array[Int], cum: Array[Int]): Array[Byte] = {
    val out = new scala.collection.mutable.ArrayBuffer[Byte]((until - from) * bpv / 2 + 8)
    var x = Low
    var i = until - 1
    while (i >= from) {
      // bytes ascending here; the decoder (which reads the stream reversed)
      // then sees each value's bytes most-significant-first
      var b = 0
      while (b < bpv) {
        val sym  = ((values(i) >>> (8 * b)) & 0xff).toInt
        val f    = freq(sym)
        val xMax = ((Low >> ProbBits) << 8) * f
        while (x >= xMax) { out += (x & 0xff).toByte; x >>= 8 }
        x = ((x / f) << ProbBits) + (x % f) + cum(sym)
        b += 1
      }
      i -= 1
    }
    out += (x & 0xff).toByte; out += ((x >> 8) & 0xff).toByte
    out += ((x >> 16) & 0xff).toByte; out += ((x >> 24) & 0xff).toByte
    out.toArray
  }

  /** Decode `count` values from an encoded block into `out(outOff...)`. */
  def decodeBlock(block: Array[Byte], count: Int, bpv: Int,
                  freq: Array[Int], cum: Array[Int], slotSym: Array[Byte],
                  out: Array[Long], outOff: Int): Unit = {
    var p = block.length - 1
    var x = 0L
    x = (x << 8) | (block(p) & 0xffL); p -= 1
    x = (x << 8) | (block(p) & 0xffL); p -= 1
    x = (x << 8) | (block(p) & 0xffL); p -= 1
    x = (x << 8) | (block(p) & 0xffL); p -= 1
    var i = 0
    while (i < count) {
      var v = 0L
      var b = bpv - 1
      while (b >= 0) {
        val slot = (x & (ProbScale - 1)).toInt
        val sym  = slotSym(slot) & 0xff
        x = freq(sym) * (x >> ProbBits) + slot - cum(sym)
        while (x < Low) { x = (x << 8) | (block(p) & 0xffL); p -= 1 }
        v |= (sym.toLong << (8 * b))
        b -= 1
      }
      out(outOff + i) = v
      i += 1
    }
  }

  def slotTable(freq: Array[Int], cum: Array[Int]): Array[Byte] = {
    val t = new Array[Byte](ProbScale)
    var s = 0
    while (s < 256) {
      var k = cum(s)
      while (k < cum(s + 1)) { t(k) = s.toByte; k += 1 }
      s += 1
    }
    t
  }
}

final class RansCompressed(val n: Int, val bpv: Int, val blockValues: Int,
                           val freq: Array[Int], val cum: Array[Int],
                           val blocks: Array[Array[Byte]]) extends CompressedInts {
  private val slotSym = Rans.slotTable(freq, cum)
  def length: Int = n
  def sizeBytes: Long =
    256 * 2 + blocks.iterator.map(b => b.length.toLong + 4).sum

  /** Random access = decode the containing block's prefix. */
  def get(i: Int): Long = {
    val blk   = i / blockValues
    val inBlk = i % blockValues
    val tmp   = new Array[Long](inBlk + 1)
    Rans.decodeBlock(blocks(blk), inBlk + 1, bpv, freq, cum, slotSym, tmp, 0)
    tmp(inBlk)
  }

  def decompressAll(): Array[Long] = {
    val out = new Array[Long](n)
    var blk = 0; var off = 0
    while (blk < blocks.length) {
      val count = math.min(blockValues, n - off)
      Rans.decodeBlock(blocks(blk), count, bpv, freq, cum, slotSym, out, off)
      off += count; blk += 1
    }
    out
  }
}

/** Uncompressed representation at a declared byte width — the `Raw` point in
  * §4.4 and the accounting denominator elsewhere.
  */
final class PlainCodec(val bytesPerValue: Int = 8) extends IntCodec {
  val name = "Plain"
  def compress(values: Array[Long]): CompressedInts = new CompressedInts {
    def length: Int = values.length
    def sizeBytes: Long = values.length.toLong * bytesPerValue
    def get(i: Int): Long = values(i)
    def decompressAll(): Array[Long] = values.clone()
  }
}
