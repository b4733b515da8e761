package repro.data

import scala.util.Random

/** A single-column integer data set for the §4 microbenchmark. */
final case class IntDataset(name: String, values: Array[Long],
                            rawBytesPerValue: Int, fullySorted: Boolean)

/** A single-column string data set for §4.6. */
final case class StringDataset(name: String, values: Array[String])

/** Deterministic synthetic analogues of the paper's twelve single-column
  * data sets (§4.1). Real sources (SOSD, MovieLens, Kaggle, …) are offline;
  * each generator preserves the serial-correlation property the paper's
  * distribution plot (Fig 9) shows — see DESIGN.md "Dataset substitutions".
  * All generators are pure functions of (n, seed).
  */
object Datasets {

  /** `linear`: clean sorted linear distribution with tiny jitter (synthetic
    * in the paper as well).
    */
  def linear(n: Int, seed: Long = 1): Array[Long] = {
    val r = new Random(seed)
    Array.tabulate(n)(i => 17L * i + 1000 + r.nextInt(5))
  }

  /** `normal`: sorted draws from a normal distribution (32-bit range). */
  def normal(n: Int, seed: Long = 2): Array[Long] = {
    val r = new Random(seed)
    val a = Array.fill(n)(
      math.min(2_100_000_000L, math.max(0L, (r.nextGaussian() * 2e8).toLong + 1_000_000_000L)))
    a.sorted
  }

  /** `poisson`: sensor-event timestamps with exponential inter-arrivals,
    * merged from several sensors so the sequence is *not* fully sorted
    * (Elias-Fano inapplicable, as in the paper).
    */
  def poisson(n: Int, seed: Long = 3): Array[Long] = {
    val r = new Random(seed)
    var t = 1_600_000_000_000L
    val a = new Array[Long](n)
    var i = 0
    while (i < n) {
      t += math.max(1, (-math.log(1.0 - r.nextDouble()) * 450.0).toLong)
      a(i) = t
      i += 1
    }
    // local out-of-orderness from merging sensor streams: jitter within ±4
    i = 0
    while (i + 8 < n) {
      val j = i + r.nextInt(4); val k = i + 4 + r.nextInt(4)
      val tmp = a(j); a(j) = a(k); a(k) = tmp
      i += 8
    }
    a
  }

  /** `ml`: sorted millisecond timestamps with bursty arrival rate
    * (UCI bar-crawl accelerometer-style).
    */
  def ml(n: Int, seed: Long = 4): Array[Long] = {
    val r = new Random(seed)
    var t = 1_500_000_000_000L
    var burst = false
    val a = new Array[Long](n)
    var i = 0
    while (i < n) {
      if (r.nextDouble() < 0.002) burst = !burst
      t += (if (burst) 1 + r.nextInt(3) else 40 + r.nextInt(200)).toLong
      a(i) = t
      i += 1
    }
    a
  }

  /** `booksale`: sorted popularity counts — Zipf body, long plateaus of
    * small values, heavy tail (SOSD books-style).
    */
  def booksale(n: Int, seed: Long = 5): Array[Long] = {
    val r = new Random(seed)
    val a = Array.fill(n) {
      val u = math.max(1e-9, r.nextDouble())
      math.min(2_000_000_000L, (3.0 / math.pow(u, 1.35)).toLong)
    }
    a.sorted
  }

  /** `facebook`: sorted 64-bit IDs — dense clusters with rare huge gaps
    * (SOSD fb-style unevenness).
    */
  def facebook(n: Int, seed: Long = 6): Array[Long] = {
    val r = new Random(seed)
    val clusters = math.max(1, n / 20000)
    val a = new Array[Long](n)
    var i = 0
    while (i < n) {
      // cluster base anywhere in [0, 2^33) (SOSD fb ids fit well below 2^53,
      // so FOR's exact-min reference and Double models stay in safe range)
      val base = math.abs(r.nextLong()) >>> 31
      val size = math.min(n - i, 500 + r.nextInt(8000))
      var k = 0
      var v = base
      while (k < size) { v += 1 + r.nextInt(50); a(i + k) = v; k += 1 }
      i += size
    }
    val _ = clusters
    a.sorted
  }

  /** `wiki`: sorted edit timestamps — near-linear with slowly drifting
    * density (diurnal/seasonal modulation).
    */
  def wiki(n: Int, seed: Long = 7): Array[Long] = {
    val r = new Random(seed)
    var t = 1_100_000_000L
    val a = new Array[Long](n)
    var i = 0
    while (i < n) {
      val rate = 1.0 + 0.8 * math.sin(i / 5000.0)
      t += math.max(1, (-math.log(1.0 - r.nextDouble()) * 30.0 / rate).toLong)
      a(i) = t
      i += 1
    }
    a
  }

  /** `movieid`: concatenated per-user sorted runs of liked movie IDs —
    * piecewise increasing sawtooth, not globally sorted (MovieLens-style,
    * the paper's motivating Figure 1).
    */
  def movieid(n: Int, seed: Long = 8): Array[Long] = {
    val r = new Random(seed)
    val maxMovie = 131_000
    val a = new Array[Long](n)
    var i = 0
    while (i < n) {
      val runLen = math.min(n - i, 20 + r.nextInt(400))
      var v = r.nextInt(2000).toLong
      val step = math.max(1, maxMovie / (runLen + 1))
      var k = 0
      while (k < runLen) { v += 1 + r.nextInt(2 * step); a(i + k) = math.min(v, maxMovie); k += 1 }
      i += runLen
    }
    a
  }

  /** `house_price`: sorted heavy-tail prices rounded to coarse grid — long
    * runs of identical values (Kaggle US real-estate-style).
    */
  def housePrice(n: Int, seed: Long = 9): Array[Long] = {
    val r = new Random(seed)
    val a = Array.fill(n) {
      val v = math.exp(12.3 + r.nextGaussian() * 0.6)
      (v / 5000.0).toLong * 5000L
    }
    a.sorted
  }

  /** The nine-dataset integer registry of §4.1, at a scale divisor
    * (paper sizes / `scaleDiv`, floored at `minN`).
    */
  def integerDatasets(scaleDiv: Int = 200, minN: Int = 20_000): Seq[IntDataset] = {
    def sz(paperN: Long): Int = math.max(minN, (paperN / scaleDiv).toInt)
    Seq(
      IntDataset("linear",      linear(sz(200_000_000L)),     4, fullySorted = true),
      IntDataset("normal",      normal(sz(200_000_000L)),     4, fullySorted = true),
      IntDataset("poisson",     poisson(sz(87_000_000L)),     8, fullySorted = false),
      IntDataset("ml",          ml(sz(14_000_000L)),          8, fullySorted = true),
      IntDataset("booksale",    booksale(sz(200_000_000L)),   4, fullySorted = true),
      IntDataset("facebook",    facebook(sz(200_000_000L)),   8, fullySorted = true),
      IntDataset("wiki",        wiki(sz(200_000_000L)),       8, fullySorted = true),
      IntDataset("movieid",     movieid(sz(20_000_000L)),     4, fullySorted = false),
      IntDataset("house_price", housePrice(math.max(minN, 100_000 / math.max(1, scaleDiv / 200))), 4, fullySorted = true),
    )
  }

  // ----- string data sets (§4.6) -----

  private val Syllables = Array("an", "ter", "ra", "mo", "li", "con", "ver", "sta",
                                "tion", "ing", "pre", "dic", "om", "ba", "ze", "qu",
                                "ish", "ed", "ly", "ment")

  /** `word`: syllable-model English-like words, sorted, ~9 chars average. */
  def words(n: Int, seed: Long = 10): Array[String] = {
    val r = new Random(seed)
    val set = scala.collection.mutable.SortedSet[String]()
    while (set.size < n) {
      val k = 2 + r.nextInt(4)
      set += (1 to k).map(_ => Syllables(r.nextInt(Syllables.length))).mkString
    }
    set.toArray
  }

  /** `email`: host-reversed addresses (`com.domain.user`), sorted — shared
    * domain prefixes dominate.
    */
  def emails(n: Int, seed: Long = 11): Array[String] = {
    val r = new Random(seed)
    val domains = Array.fill(40)(Syllables(r.nextInt(Syllables.length)) +
                                 Syllables(r.nextInt(Syllables.length)))
    val tlds = Array("com", "org", "net")
    val a = Array.fill(n) {
      val user = (1 to (1 + r.nextInt(2))).map(_ => Syllables(r.nextInt(Syllables.length))).mkString +
                 (1000 + r.nextInt(9000)) // digit tails, as in real addresses
      s"${tlds(r.nextInt(tlds.length))}.${domains(r.nextInt(domains.length))}.$user"
    }
    a.sorted
  }

  /** `hex`: sorted hexadecimal strings up to 8 chars. */
  def hexes(n: Int, seed: Long = 12): Array[String] = {
    val r = new Random(seed)
    val a = Array.fill(n)(java.lang.Long.toHexString(math.abs(r.nextLong()) & 0xffffffffL))
    a.sorted
  }

  def stringDatasets(scaleDiv: Int = 1): Seq[StringDataset] = Seq(
    StringDataset("email", emails(math.max(1000, 30_000 / scaleDiv))),
    StringDataset("hex",   hexes(math.max(1000, 100_000 / scaleDiv))),
    StringDataset("word",  words(math.max(1000, 222_000 / scaleDiv))),
  )

  /** `medicare`-like probe column for §4.4: Zipf-distributed draws over a
    * large sorted unique 64-bit domain. Returns (probe values, sorted
    * unique dictionary domain).
    */
  def medicare(nProbe: Int, nUnique: Int, seed: Long = 13): (Array[Long], Array[Long]) = {
    val r = new Random(seed)
    // near-arithmetic ID domain (constant stride + tiny independent jitter):
    // LeCo's linear model is near-exact here, FOR still pays the frame span —
    // this is what produces the paper's 0.23% vs 17% dictionary sizes.
    val domain = Array.tabulate(nUnique)(i => 10_000_000_000L + 100L * i + r.nextInt(2))
    val probe = Array.fill(nProbe) {
      val u = math.max(1e-12, r.nextDouble())
      val rank = math.min(nUnique - 1, (nUnique * math.pow(u, 3.0)).toInt)
      domain(rank)
    }
    (probe, domain)
  }
}
