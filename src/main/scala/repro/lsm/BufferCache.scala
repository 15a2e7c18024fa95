package repro.lsm

import java.io.RandomAccessFile
import repro.encoding.PageCompressor
import scala.collection.mutable

/** Disk / cache counters — the I/O-cost proxy reported by every benchmark
  * (our substitute for the paper's wall-clock-on-NVMe numbers; shapes match
  * because page reads dominate the scan paths being compared).
  */
final class IoStats {
  var logicalReads = 0L   // page requests (cache hits + misses)
  var diskReads = 0L      // cache misses → physical reads
  var diskBytesRead = 0L  // compressed bytes fetched
  var pagesWritten = 0L
  var diskBytesWritten = 0L
  def reset(): Unit = { logicalReads = 0; diskReads = 0; diskBytesRead = 0; pagesWritten = 0; diskBytesWritten = 0 }
  override def toString =
    f"IoStats(logical=$logicalReads, disk=$diskReads, readMB=${diskBytesRead / 1e6}%.1f, written=$pagesWritten)"
}

/** LRU page cache shared by all components of a dataset (the paper's 10 GB
  * system buffer cache, scaled). Keys are (fileId, pageIdx); values are the
  * decompressed logical pages.
  */
final class BufferCache(val capacityPages: Int, val stats: IoStats = new IoStats) {
  private val lru = new java.util.LinkedHashMap[(Long, Int), Array[Byte]](64, 0.75f, true) {
    override def removeEldestEntry(e: java.util.Map.Entry[(Long, Int), Array[Byte]]): Boolean =
      size() > capacityPages
  }

  def get(fileId: Long, page: Int)(load: => Array[Byte]): Array[Byte] = synchronized {
    stats.logicalReads += 1
    val k = (fileId, page)
    val hit = lru.get(k)
    if (hit != null) hit
    else {
      val bytes = load
      lru.put(k, bytes)
      bytes
    }
  }

  def invalidateFile(fileId: Long): Unit = synchronized {
    val it = lru.keySet().iterator()
    while (it.hasNext) if (it.next()._1 == fileId) it.remove()
  }

  def clear(): Unit = synchronized { lru.clear() }
}

/** One on-disk component file of Snappy-compressed logical pages (§6 setup:
  * page-level compression on every layout). The page offset table lives in
  * the component's meta, so reads are a single seek + read + decompress.
  */
final class PagedFile private (
    val fileId: Long,
    val path: java.io.File,
    val pageOffsets: Array[Long],  // length = nPages + 1 (end sentinel)
    cache: BufferCache,
) {
  def numPages: Int = pageOffsets.length - 1
  def sizeOnDisk: Long = pageOffsets.last

  def readPage(i: Int): Array[Byte] =
    cache.get(fileId, i) {
      val raf = new RandomAccessFile(path, "r")
      try {
        val off = pageOffsets(i)
        val len = (pageOffsets(i + 1) - off).toInt
        val buf = new Array[Byte](len)
        raf.seek(off); raf.readFully(buf)
        cache.stats.diskReads += 1
        cache.stats.diskBytesRead += len
        PageCompressor.decompress(buf)
      } finally raf.close()
    }

  def delete(): Unit = { cache.invalidateFile(fileId); path.delete(): Unit }
}

object PagedFile {
  private val nextId = new java.util.concurrent.atomic.AtomicLong(0)

  /** Write logical pages (compressing each) and return the readable file. */
  def write(path: java.io.File, pages: Iterable[Array[Byte]], cache: BufferCache): PagedFile = {
    val out = new java.io.BufferedOutputStream(new java.io.FileOutputStream(path), 1 << 20)
    val offsets = mutable.ArrayBuffer[Long](0L)
    var off = 0L
    try {
      pages.foreach { raw =>
        val framed = PageCompressor.compress(raw)
        out.write(framed)
        off += framed.length
        offsets += off
        cache.stats.pagesWritten += 1
        cache.stats.diskBytesWritten += framed.length
      }
    } finally out.close()
    new PagedFile(nextId.incrementAndGet(), path, offsets.toArray, cache)
  }

  /** Reopen from a stored offsets table (component meta). */
  def open(path: java.io.File, offsets: Array[Long], cache: BufferCache): PagedFile =
    new PagedFile(nextId.incrementAndGet(), path, offsets, cache)
}
