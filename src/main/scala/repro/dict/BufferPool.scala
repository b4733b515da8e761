package repro.dict

import java.io.{File, RandomAccessFile}

/** File-backed page store with an LRU buffer pool — the memory-budget
  * substrate for the §4.4 dictionary experiment.
  *
  * Pages are fetched from the backing file on miss. Because the host OS page
  * cache makes re-reads memory-speed, the pool *models* NVMe direct-I/O by
  * accounting `missLatencyNanos` per miss into `modeledIoNanos`; benches
  * report composite time = measured CPU + modeled I/O (DESIGN.md: hardware
  * substitution).
  */
final class BufferPool(file: File, val pageSize: Int, budgetBytes: Long,
                       val missLatencyNanos: Long = 20_000) {
  private val raf = new RandomAccessFile(file, "r")
  private val maxPages = math.max(1, (budgetBytes / pageSize).toInt)
  var hits: Long = 0
  var misses: Long = 0

  private val lru = new java.util.LinkedHashMap[Int, Array[Byte]](16, 0.75f, true) {
    override def removeEldestEntry(e: java.util.Map.Entry[Int, Array[Byte]]): Boolean =
      size() > maxPages
  }

  def modeledIoNanos: Long = misses * missLatencyNanos

  def readPage(pageId: Int): Array[Byte] = {
    val cached = lru.get(pageId)
    if (cached != null) { hits += 1; cached }
    else {
      misses += 1
      val buf = new Array[Byte](pageSize)
      raf.seek(pageId.toLong * pageSize)
      val fileLen = raf.length()
      val want = math.min(pageSize.toLong, fileLen - pageId.toLong * pageSize).toInt
      raf.readFully(buf, 0, math.max(0, want))
      lru.put(pageId, buf)
      buf
    }
  }

  /** Read an arbitrary `[off, off+len)` byte range through the pool. */
  def readBytes(off: Long, len: Int): Array[Byte] = {
    val out = new Array[Byte](len)
    var done = 0
    while (done < len) {
      val pos    = off + done
      val page   = (pos / pageSize).toInt
      val inPage = (pos % pageSize).toInt
      val take   = math.min(len - done, pageSize - inPage)
      System.arraycopy(readPage(page), inPage, out, done, take)
      done += take
    }
    out
  }

  def readLongAt(off: Long): Long = {
    val b = readBytes(off, 8)
    java.nio.ByteBuffer.wrap(b).getLong
  }

  def resetStats(): Unit = { hits = 0; misses = 0 }
  def close(): Unit = raf.close()
}
