package repro.core

/** A compressed representation of a `Long` column chunk.
  *
  * `sizeBytes` is the accounting size used for compression ratios: the bytes
  * a serialized blob of this representation needs (headers + metadata +
  * packed payload). `get` is point random access; `decompressAll` is the
  * sequential full-decode path used by scans.
  */
trait CompressedInts {
  def length: Int
  def sizeBytes: Long
  def get(i: Int): Long
  def decompressAll(): Array[Long]

  /** Bytes spent on models/headers (vs. the delta payload) — the Fig 10
    * compression-ratio breakdown. 0 where the split is not meaningful.
    */
  def modelBytes: Long = 0L
}

/** An integer compression scheme (one of the seven evaluated in §4). */
trait IntCodec {
  def name: String
  def compress(values: Array[Long]): CompressedInts

  /** Compression ratio = compressed / uncompressed, uncompressed at
    * `rawBytesPerValue` bytes per value (the paper uses the dataset's
    * declared 32/64-bit width).
    */
  def ratio(values: Array[Long], rawBytesPerValue: Int): Double = {
    val c = compress(values)
    c.sizeBytes.toDouble / (values.length.toLong * rawBytesPerValue)
  }
}

/** Shared helpers for per-partition formats. */
object Codec {
  /** Header cost (bytes) of a LeCo linear partition: θ0, θ1 (two f64), the
    * delta bit width (1B) and the partition length / start index (4B).
    */
  val LinearHeaderBytes: Int = 8 + 8 + 1 + 4
  /** Header cost of a FOR / Delta partition: 8B reference + width + length. */
  val SimpleHeaderBytes: Int = 8 + 1 + 4
}
