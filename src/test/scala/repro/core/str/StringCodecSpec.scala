package repro.core.str

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets

class StringCodecSpec extends AnyFunSuite {

  private def roundtrip(codec: StringCodec, values: Array[String]): Unit = {
    val c = codec.compress(values)
    val dec = c.decompressAll()
    values.indices.foreach(i => assert(dec(i) == values(i), s"at $i: '${dec(i)}' vs '${values(i)}'"))
    // random access spot checks
    val r = new scala.util.Random(7)
    (1 to math.min(50, values.length)).foreach { _ =>
      val i = r.nextInt(values.length)
      assert(c.get(i) == values(i), s"get($i)")
    }
  }

  val cases: Seq[(String, Array[String])] = Seq(
    "simple-abc"      -> Array("aaa", "aab", "abc", "abd", "bcd"),
    "shared-prefix"   -> Array.tabulate(100)(i => f"prefix$i%05d"),
    "varying-length"  -> Array("a", "ab", "abc", "b", "ba", "z"),
    "identical"       -> Array.fill(50)("same"),
    "single"          -> Array("onlyone"),
    "hex-like"        -> Array.tabulate(200)(i => java.lang.Long.toHexString(i * 7919L)),
    "numbers"         -> Array.tabulate(300)(i => f"user${i * 13}%012d"),
    "mixed-charset"   -> Array("Alpha1", "Beta22", "Gamma3", "delta4", "zeta99"),
  )

  for ((name, values) <- cases; pow2 <- Seq(false, true)) {
    test(s"LeCo-str(pow2=$pow2) roundtrips $name") {
      roundtrip(new LecoStringCodec(64, pow2), values.sorted)
    }
  }

  test("LeCo-str roundtrips unsorted input too (no sortedness required)") {
    roundtrip(new LecoStringCodec(32, powerOfTwoBase = false),
              Array("zeta", "alpha", "mid", "beta", "omega"))
  }

  test("LeCo-str on email dataset") {
    roundtrip(new LecoStringCodec(256, powerOfTwoBase = true), Datasets.emails(2000))
  }

  test("LeCo-str on hex dataset") {
    roundtrip(new LecoStringCodec(256, powerOfTwoBase = false), Datasets.hexes(2000))
  }

  test("LeCo-str on word dataset") {
    roundtrip(new LecoStringCodec(256, powerOfTwoBase = true), Datasets.words(2000))
  }

  test("common prefix is extracted (size advantage on shared-prefix data)") {
    val vals = Array.tabulate(256)(i => f"com.example.host.$i%08d")
    val c = new LecoStringCodec(256, powerOfTwoBase = false).compress(vals)
    assert(c.parts.head.prefix.startsWith("com.example.host."))
  }

  test("charset reduction: digits-only partition uses small base") {
    val vals = Array.tabulate(128)(i => f"$i%06d")
    val c = new LecoStringCodec(128, powerOfTwoBase = false).compress(vals)
    assert(c.parts.head.base <= 10, s"base ${c.parts.head.base}")
  }

  test("pow2 base rounds the alphabet size up to a power of two") {
    val vals = Array.tabulate(128)(i => f"$i%06d") // 10 distinct chars
    val c = new LecoStringCodec(128, powerOfTwoBase = true).compress(vals)
    assert(c.parts.head.base == 16)
  }

  test("compression beats raw on sequential zero-padded keys") {
    val vals = Array.tabulate(4096)(i => f"user${i * 3}%016d")
    val codec = new LecoStringCodec(256, powerOfTwoBase = true)
    val ratio = codec.ratio(vals)
    assert(ratio < 0.5, s"ratio $ratio")
  }

  test("order preservation of the integer mapping within a partition") {
    val vals = Array("aab", "aac", "abz", "azz", "baa").sorted
    val c = new LecoStringCodec(8, powerOfTwoBase = false).compress(vals)
    // decoded order must match input order
    assert(c.decompressAll().sameElements(vals))
  }

  test("ratio() uses the sum of string lengths as the raw size") {
    val vals = Array("ab", "cd")
    val codec = new LecoStringCodec(2)
    assert(codec.ratio(vals) == codec.compress(vals).sizeBytes / 4.0)
  }
}
