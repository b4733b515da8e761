package repro.lsm

import java.io.File
import org.scalatest.funsuite.AnyFunSuite

class LsmSpec extends AnyFunSuite {

  private def tmpDir(): File = {
    val d = java.nio.file.Files.createTempDirectory("lsmspec").toFile
    d.deleteOnExit()
    d
  }

  private def buildSmall(n: Int = 2000): (SSTable, Array[String]) = {
    val keys = Array.tabulate(n)(i => f"user${i * 3 + 1}%016d")
    val value = Array.fill[Byte](100)(7)
    val t = SSTable.build(new File(tmpDir(), "t.db"), keys.iterator.map(k => (k, value)))
    (t, keys)
  }

  test("SSTable blocks partition the records; separators are block last-keys") {
    val (t, keys) = buildSmall()
    assert(t.numBlocks > 1)
    assert(t.separators.last == keys.last)
    assert(t.separators.sameElements(t.separators.sorted))
  }

  test("searchBlock finds the first key >= target") {
    val (t, keys) = buildSmall()
    val block = t.readBlock(0)
    assert(t.searchBlock(block, keys(0)) != null)
    assert(t.searchBlock(block, "user9999999999999999") == null) // past end
  }

  for (config <- Seq("LeCo", "Baseline_1", "Baseline_16", "Baseline_128")) {
    test(s"$config index finds the right block for every key") {
      val (t, keys) = buildSmall()
      val db = repro.experiments.LsmBench.Db(t, keys, 0)
      val idx = repro.experiments.LsmBench.indexFor(db, config)
      // the block found must contain a separator >= key and the previous
      // separator (if any) must be < key
      for (k <- keys.indices by 37) {
        val key = keys(k)
        val b = idx.findBlock(key)
        assert(b < t.numBlocks, s"key $key fell off the end")
        assert(t.separators(b) >= key)
        if (b > 0) assert(t.separators(b - 1) < key)
      }
    }

    test(s"$config seek returns a value for every existing key") {
      val (t, keys) = buildSmall(500)
      val db = repro.experiments.LsmBench.Db(t, keys, 0)
      val lsm = new MiniLsm(t, repro.experiments.LsmBench.indexFor(db, config), 1 << 20)
      keys.indices.by(13).foreach(i => assert(lsm.seek(keys(i)) != null, s"seek ${keys(i)}"))
    }
  }

  test("index handles round-trip offsets/lengths") {
    val (t, keys) = buildSmall()
    val db = repro.experiments.LsmBench.Db(t, keys, 0)
    val leco = repro.experiments.LsmBench.indexFor(db, "LeCo")
    val ri = repro.experiments.LsmBench.indexFor(db, "Baseline_1")
    (0 until t.numBlocks by 7).foreach { b =>
      assert(leco.handle(b) == t.blockHandles(b))
      assert(ri.handle(b) == t.blockHandles(b))
    }
  }

  test("index sizes: RI_1 largest; RI_128 and LeCo much smaller") {
    val (t, keys) = buildSmall(5000)
    val db = repro.experiments.LsmBench.Db(t, keys, 0)
    val s1   = repro.experiments.LsmBench.indexFor(db, "Baseline_1").sizeBytes
    val s128 = repro.experiments.LsmBench.indexFor(db, "Baseline_128").sizeBytes
    val sl   = repro.experiments.LsmBench.indexFor(db, "LeCo").sizeBytes
    assert(s128 < s1)
    assert(sl < s1 / 2, s"LeCo index $sl vs RI1 $s1")
  }

  test("block cache: small budget misses, large budget hits after warmup") {
    val (t, keys) = buildSmall(3000)
    val db = repro.experiments.LsmBench.Db(t, keys, 0)
    val idx = repro.experiments.LsmBench.indexFor(db, "Baseline_1")
    val tiny = new MiniLsm(t, idx, idx.sizeBytes + 8192)
    keys.indices.by(3).foreach(i => tiny.seek(keys(i)))
    assert(tiny.misses > 50)
    val big = new MiniLsm(t, idx, 64 << 20)
    keys.indices.by(3).foreach(i => big.seek(keys(i)))
    big.resetStats()
    keys.indices.by(3).foreach(i => big.seek(keys(i)))
    assert(big.misses == 0)
  }

  test("seek on a key between records returns the successor's value") {
    val keys = Array("b", "d", "f").map(_ * 10)
    val t = SSTable.build(new File(tmpDir(), "s.db"),
                          keys.iterator.map(k => (k, k.getBytes)))
    val db = repro.experiments.LsmBench.Db(t, keys, 0)
    val lsm = new MiniLsm(t, repro.experiments.LsmBench.indexFor(db, "LeCo"), 1 << 20)
    assert(new String(lsm.seek("c" * 10)) == "d" * 10)
    assert(new String(lsm.seek("a")) == "b" * 10)
    assert(lsm.seek("z") == null)
  }
}
