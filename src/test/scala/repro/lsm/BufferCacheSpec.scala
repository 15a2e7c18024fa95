package repro.lsm

import org.scalatest.funsuite.AnyFunSuite

class BufferCacheSpec extends AnyFunSuite {

  private def writeFile(pages: Seq[Array[Byte]], cache: BufferCache): PagedFile = {
    val f = java.io.File.createTempFile("bcache", ".data")
    PagedFile.write(f, pages, cache)
  }

  test("paged file round-trips logical pages through snappy frames") {
    val cache = new BufferCache(8)
    val pages = (0 until 5).map(i => Array.fill[Byte](1000 + i)(i.toByte))
    val pf = writeFile(pages, cache)
    assert(pf.numPages == 5)
    (0 until 5).foreach(i => assert(pf.readPage(i).toSeq == pages(i).toSeq))
  }

  test("cache hits avoid disk reads; misses count them") {
    val cache = new BufferCache(8)
    val pf = writeFile((0 until 4).map(i => Array.fill[Byte](100)(i.toByte)), cache)
    cache.stats.reset()
    pf.readPage(0); pf.readPage(0); pf.readPage(1)
    assert(cache.stats.logicalReads == 3)
    assert(cache.stats.diskReads == 2)
  }

  test("LRU evicts the coldest page at capacity") {
    val cache = new BufferCache(2)
    val pf = writeFile((0 until 3).map(i => Array.fill[Byte](50)(i.toByte)), cache)
    cache.stats.reset()
    pf.readPage(0); pf.readPage(1) // cache: {0,1}
    pf.readPage(0)                 // touch 0 → 1 is eldest
    pf.readPage(2)                 // evicts 1
    pf.readPage(0)                 // hit
    assert(cache.stats.diskReads == 3)
    pf.readPage(1)                 // miss again
    assert(cache.stats.diskReads == 4)
  }

  test("deleting a file invalidates its cached pages") {
    val cache = new BufferCache(8)
    val pf = writeFile(Seq(Array.fill[Byte](10)(1)), cache)
    pf.readPage(0)
    pf.delete()
    // Re-reading would hit disk (file gone) — the cache must not serve it.
    intercept[Exception](pf.readPage(0))
  }

  test("write accounting records compressed bytes") {
    val cache = new BufferCache(8)
    cache.stats.reset()
    val pf = writeFile(Seq(Array.fill[Byte](100000)(7)), cache)
    assert(cache.stats.pagesWritten == 1)
    assert(cache.stats.diskBytesWritten < 50000, "constant page must compress")
    assert(pf.sizeOnDisk == cache.stats.diskBytesWritten)
  }
}
