package repro.lsm.layout

import repro.core._
import repro.encoding.{BufReader, BufWriter}
import repro.lsm._
import scala.collection.mutable

/** Slotted-page component for the row-major layouts (Open and VB).
  *
  * Page layout: `[nRecs varint][dir: (key 8B, anti 1B, offset 4B) × n]
  * [record bytes…]` — keys in the directory give in-page binary search for
  * point lookups (the logarithmic search §4.6 contrasts with columnar
  * layouts' linear decode).
  */
object RowLayout {

  final class Writer(kind: LayoutKind, schema: Schema, dict: FieldDict, config: LsmConfig) {
    private val pages = mutable.ArrayBuffer.empty[Array[Byte]]
    private val pageMinMax = mutable.ArrayBuffer.empty[(Int, Long, Long)]
    private val curRecs = mutable.ArrayBuffer.empty[(Long, Boolean, Array[Byte])]
    private var curBytes = 0
    private var nEntries = 0L
    private var nAnti = 0L
    private var minKey = Long.MaxValue
    private var maxKey = Long.MinValue

    /** `body` is the pre-serialized record in this layout's row format
      * (serialized at insert time into the in-memory component, so the
      * construction cost lands on ingestion, as in the paper).
      */
    def add(key: Long, antimatter: Boolean, body: Array[Byte]): Unit = {
      val b = if (antimatter) Array.emptyByteArray else body
      curRecs += ((key, antimatter, b))
      curBytes += b.length + 13
      nEntries += 1
      if (antimatter) nAnti += 1
      minKey = math.min(minKey, key); maxKey = math.max(maxKey, key)
      if (curBytes >= config.pageSize - 64) cutPage()
    }

    private def cutPage(): Unit = {
      if (curRecs.isEmpty) return
      val out = new BufWriter(curBytes + 64)
      out.writeVarInt(curRecs.length)
      val dirSizeGuess = out.size + curRecs.length * 13
      var off = dirSizeGuess
      curRecs.foreach { case (k, a, b) =>
        out.writeLongLE(k); out.writeByte(if (a) 1 else 0); out.writeIntLE(off)
        off += b.length
      }
      curRecs.foreach { case (_, _, b) => out.writeBytes(b) }
      pages += out.toArray
      pageMinMax += ((curRecs.length, curRecs.head._1, curRecs.last._1))
      curRecs.clear(); curBytes = 0
    }

    def finish(dataPath: java.io.File, metaPath: java.io.File, cache: BufferCache): ComponentHandle = {
      cutPage()
      val file = PagedFile.write(dataPath, pages, cache)
      val dir = new BufWriter(pageMinMax.length * 20 + 8)
      dir.writeVarInt(pageMinMax.length)
      pageMinMax.foreach { case (n, mn, mx) => dir.writeVarInt(n); dir.writeLongLE(mn); dir.writeLongLE(mx) }
      val meta = ComponentMeta(kind, nEntries, nAnti,
        if (nEntries == 0) 0 else minKey, if (nEntries == 0) 0 else maxKey,
        schema, dict, file.pageOffsets, dir.toArray, config.pageSize)
      java.nio.file.Files.write(metaPath.toPath, meta.serialize())
      new Handle(seqOf(dataPath), meta, file, metaPath)
    }
  }

  private def seqOf(f: java.io.File): Long =
    f.getName.stripPrefix("c").takeWhile(_.isDigit).toLong

  final case class PageInfo(nRecs: Int, minKey: Long, maxKey: Long)

  def parseDirectory(dir: Array[Byte]): Array[PageInfo] = {
    val in = new BufReader(dir)
    Array.fill(in.readVarInt())(PageInfo(in.readVarInt(), in.readLongLE(), in.readLongLE()))
  }

  final class Handle(val seq: Long, val meta: ComponentMeta, val file: PagedFile,
                     val metaPath: java.io.File) extends ComponentHandle {
    private lazy val dir = parseDirectory(meta.directory)

    def newCursor(datasetSchema: Schema, projection: Array[Int]): CompCursor = new Cursor

    private def decodeBody(page: Array[Byte], off: Int): JObject = {
      val v = if (meta.layout == LayoutKind.Open) OpenCodec.read(page, off)
              else VbCodec.read(page, off, meta.dict)
      v.asInstanceOf[JObject]
    }

    final class Cursor extends CompCursor {
      private var pageIdx = -1
      private var page: Array[Byte] = _
      private var nRecs = 0
      private var slot = -1
      private var dirBase = 0
      var key: Long = _
      var isAntimatter: Boolean = _
      private var offset = 0

      def advance(): Boolean = {
        slot += 1
        while (pageIdx < 0 || slot >= nRecs) {
          pageIdx += 1
          if (pageIdx >= file.numPages) return false
          page = file.readPage(pageIdx)
          val in = new BufReader(page)
          nRecs = in.readVarInt()
          dirBase = in.position
          slot = 0
        }
        val in = new BufReader(page, dirBase + slot * 13)
        key = in.readLongLE()
        isAntimatter = in.readByte() == 1
        offset = in.readIntLE()
        true
      }

      def rowMajor: Boolean = true
      def shapes(): Array[Shape] = null
      def record(): JObject = decodeBody(page, offset)
    }

    def pointLookup(key: Long, datasetSchema: Schema,
                    projection: Array[Int] = null): Option[Option[JObject]] = {
      // Row-major: the whole record is decoded regardless of projection.
      if (meta.numEntries == 0 || key < meta.minKey || key > meta.maxKey) return None
      // Binary search pages by key range, then slots within the page.
      var lo = 0; var hi = dir.length - 1
      while (lo <= hi) {
        val mid = (lo + hi) >>> 1
        if (key < dir(mid).minKey) hi = mid - 1
        else if (key > dir(mid).maxKey) lo = mid + 1
        else {
          val page = file.readPage(mid)
          val in = new BufReader(page)
          val n = in.readVarInt()
          val base = in.position
          var a = 0; var b = n - 1
          while (a <= b) {
            val m = (a + b) >>> 1
            val r = new BufReader(page, base + m * 13)
            val k = r.readLongLE()
            if (key < k) b = m - 1
            else if (key > k) a = m + 1
            else {
              val anti = r.readByte() == 1
              val off = r.readIntLE()
              return Some(if (anti) None else Some(decodeBody(page, off)))
            }
          }
          return None
        }
      }
      None
    }
  }

  def open(seq: Long, dataPath: java.io.File, metaPath: java.io.File, cache: BufferCache): Handle = {
    val meta = ComponentMeta.deserialize(java.nio.file.Files.readAllBytes(metaPath.toPath))
    new Handle(seq, meta, PagedFile.open(dataPath, meta.pageOffsets, cache), metaPath)
  }
}
