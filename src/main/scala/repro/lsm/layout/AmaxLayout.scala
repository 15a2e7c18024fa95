package repro.lsm.layout

import repro.core._
import repro.encoding.{AtomicType, BufReader, BufWriter}
import repro.lsm._
import scala.collection.mutable

/** AMAX (§4.3): mega leaf nodes of ≤ `amaxLeafRecords` records. Page 0 holds
  * the header, per-column min/max prefixes, the column directory, and the
  * encoded primary keys; each column's megapage then occupies a byte span in
  * the leaf's data region, written largest-to-smallest with the
  * empty-page-tolerance rule, so a projection reads only the physical pages
  * its columns touch.
  */
object AmaxLayout {
  import ApaxLayout.ColumnFeeder

  /** 8-byte order-preserving prefix used for zone-map filtering in Page 0. */
  def prefixOf(v: JValue): Long = v match {
    case JLong(l)   => l
    case JDouble(d) => java.lang.Double.doubleToLongBits(d)
    case JString(s) =>
      val bs = s.getBytes("UTF-8")
      var acc = 0L
      var i = 0
      while (i < 8) { acc = (acc << 8) | (if (i < bs.length) bs(i) & 0xffL else 0L); i += 1 }
      acc
    case JBool(b) => if (b) 1L else 0L
    case _        => 0L
  }

  final case class ColDirEntry(colId: Int, start: Int, len: Int,
                               minPrefix: Long, maxPrefix: Long,
                               minStr: String, maxStr: String, exactStr: Boolean)

  final class Writer(schema: Schema, dict: FieldDict, config: LsmConfig) {
    private val pages = mutable.ArrayBuffer.empty[Array[Byte]]
    // leaf directory: startPage, nPages, nRecs, minKey, maxKey
    private val leafDir = mutable.ArrayBuffer.empty[(Int, Int, Int, Long, Long)]
    private var pk = new PkChunk.Writer
    private var writers: Array[ColumnChunkWriter] = newWriters()
    private val sink: ColumnSink = new ColumnSink {
      def entry(col: Int, defLevel: Int, value: JValue): Unit = writers(col).entry(defLevel, value)
      def delimiter(col: Int, d: Int): Unit = writers(col).delimiter(d)
    }
    private var leafMinKey = Long.MaxValue
    private var leafMaxKey = Long.MinValue
    private var nEntries = 0L
    private var nAnti = 0L
    private var minKey = Long.MaxValue
    private var maxKey = Long.MinValue

    private def newWriters(): Array[ColumnChunkWriter] =
      schema.columns.map(m => new ColumnChunkWriter(m)).toArray

    def add(key: Long, antimatter: Boolean, feed: ColumnFeeder): Unit = {
      pk.add(key, antimatter)
      if (!antimatter) feed(sink)
      leafMinKey = math.min(leafMinKey, key); leafMaxKey = math.max(leafMaxKey, key)
      minKey = math.min(minKey, key); maxKey = math.max(maxKey, key)
      nEntries += 1; if (antimatter) nAnti += 1
      if (pk.count >= config.amaxLeafRecords) cutLeaf()
    }

    private def truncStr(v: JValue): (String, Boolean) = v match {
      case JString(s) => if (s.length <= 48) (s, true) else (s.substring(0, 48), false)
      case _          => ("", false)
    }

    private def cutLeaf(): Unit = {
      if (pk.count == 0) return
      val P = config.pageSize
      // Megapages ordered largest → smallest (§4.3), packed into the data
      // region; the empty-page-tolerance rule decides page sharing.
      val chunks: Array[(ColumnChunkWriter, Array[Byte])] =
        writers.map(w => (w, w.finish())).sortBy(-_._2.length)
      val dirEntries = mutable.ArrayBuffer.empty[ColDirEntry]
      val region = new BufWriter(chunks.map(_._2.length).sum + 64)
      chunks.foreach { case (w, bytes) =>
        val remaining = P - (region.size % P)
        if (bytes.length > remaining && remaining <= (config.emptyPageTolerance * P).toInt) {
          // Pad to the next page boundary rather than splitting the column's
          // first bytes across a mostly-empty page.
          var i = 0
          while (i < remaining) { region.writeByte(0); i += 1 }
        }
        val (ms, msExact) = truncStr(w.minValue)
        val (xs, xsExact) = truncStr(w.maxValue)
        dirEntries += ColDirEntry(w.meta.columnId, region.size, bytes.length,
          prefixOf(w.minValue), prefixOf(w.maxValue), ms, xs, msExact && xsExact)
        region.writeBytes(bytes)
      }
      // Page 0
      val p0 = new BufWriter(config.pageSize / 2)
      p0.writeVarInt(pk.count)
      p0.writeVarInt(dirEntries.length)
      p0.writeLongLE(leafMinKey); p0.writeLongLE(leafMaxKey)
      val pkBytes = pk.finish()
      p0.writeVarInt(pkBytes.length); p0.writeBytes(pkBytes)
      dirEntries.foreach { e =>
        p0.writeVarInt(e.colId); p0.writeVarInt(e.start); p0.writeVarInt(e.len)
        p0.writeLongLE(e.minPrefix); p0.writeLongLE(e.maxPrefix)
        p0.writeString(e.minStr); p0.writeString(e.maxStr); p0.writeByte(if (e.exactStr) 1 else 0)
      }
      val startPage = pages.length
      pages += p0.toArray
      val regionBytes = region.toArray
      var off = 0
      while (off < regionBytes.length) {
        val len = math.min(P, regionBytes.length - off)
        pages += java.util.Arrays.copyOfRange(regionBytes, off, off + len)
        off += len
      }
      leafDir += ((startPage, pages.length - startPage, pk.count, leafMinKey, leafMaxKey))
      pk = new PkChunk.Writer
      writers = newWriters()
      leafMinKey = Long.MaxValue; leafMaxKey = Long.MinValue
    }

    def finish(dataPath: java.io.File, metaPath: java.io.File, cache: BufferCache): Handle = {
      cutLeaf()
      val file = PagedFile.write(dataPath, pages, cache)
      val dir = new BufWriter(64)
      dir.writeVarInt(leafDir.length)
      leafDir.foreach { case (sp, np, nr, mn, mx) =>
        dir.writeVarInt(sp); dir.writeVarInt(np); dir.writeVarInt(nr)
        dir.writeLongLE(mn); dir.writeLongLE(mx)
      }
      val meta = ComponentMeta(LayoutKind.Amax, nEntries, nAnti,
        if (nEntries == 0) 0 else minKey, if (nEntries == 0) 0 else maxKey,
        schema, dict, file.pageOffsets, dir.toArray, config.pageSize)
      java.nio.file.Files.write(metaPath.toPath, meta.serialize())
      val seq = dataPath.getName.stripPrefix("c").takeWhile(_.isDigit).toLong
      new Handle(seq, meta, file, metaPath)
    }
  }

  final case class LeafInfo(startPage: Int, nPages: Int, nRecs: Int, minKey: Long, maxKey: Long)

  /** Parsed Page 0 of a mega leaf. */
  final class LeafView(handle: Handle, val info: LeafInfo) {
    private val p0 = handle.file.readPage(info.startPage)
    private val in = new BufReader(p0)
    val nRecs: Int = in.readVarInt()
    private val nCols = in.readVarInt()
    val minKey: Long = in.readLongLE()
    val maxKey: Long = in.readLongLE()
    private val pkLen = in.readVarInt()
    private val pkStart = { val s = in.position; in.skipBytes(pkLen); s }
    val (keys, anti) = PkChunk.decode(p0, pkStart, pkStart + pkLen, nRecs)
    val colDir: Map[Int, ColDirEntry] = {
      val m = Map.newBuilder[Int, ColDirEntry]
      var i = 0
      while (i < nCols) {
        val id = in.readVarInt(); val st = in.readVarInt(); val len = in.readVarInt()
        val mnp = in.readLongLE(); val mxp = in.readLongLE()
        val mns = in.readString(); val mxs = in.readString(); val ex = in.readByte() == 1
        m += id -> ColDirEntry(id, st, len, mnp, mxp, mns, mxs, ex)
        i += 1
      }
      m.result()
    }

    /** Read only the physical pages a column's megapage spans (§4.4). */
    def columnBytes(e: ColDirEntry): Array[Byte] = {
      val P = handle.pageSize
      val first = e.start / P
      val last = if (e.len == 0) first else (e.start + e.len - 1) / P
      val out = new Array[Byte](e.len)
      var p = first
      var copied = 0
      while (p <= last) {
        val page = handle.file.readPage(info.startPage + 1 + p)
        val pageBase = p * P
        val from = math.max(e.start, pageBase) - pageBase
        val to = math.min(e.start + e.len, pageBase + page.length) - pageBase
        System.arraycopy(page, from, out, copied, to - from)
        copied += to - from
        p += 1
      }
      out
    }

    def reader(meta: ColumnMeta): ColumnChunkReader =
      colDir.get(meta.columnId) match {
        case Some(e) =>
          val b = columnBytes(e)
          new ColumnChunkReader(meta, b, 0, b.length)
        case None => ColumnChunkReader.allAbsent(meta)
      }

    /** Zone-map check: can any value of `colId` fall in [lo, hi]? (§4.3/§4.4) */
    def mayContain(colMeta: ColumnMeta, lo: JValue, hi: JValue): Boolean =
      colDir.get(colMeta.columnId) match {
        case None => false // column absent in this component: no record matches
        case Some(e) =>
          colMeta.tpe match {
            case AtomicType.TLong =>
              val l = lo match { case JLong(v) => v; case _ => Long.MinValue }
              val h = hi match { case JLong(v) => v; case _ => Long.MaxValue }
              !(e.maxPrefix < l || e.minPrefix > h)
            case AtomicType.TDouble =>
              val l = lo match { case JDouble(v) => v; case _ => Double.NegativeInfinity }
              val h = hi match { case JDouble(v) => v; case _ => Double.PositiveInfinity }
              val mn = java.lang.Double.longBitsToDouble(e.minPrefix)
              val mx = java.lang.Double.longBitsToDouble(e.maxPrefix)
              !(mx < l || mn > h)
            case AtomicType.TString =>
              val l = lo match { case JString(v) => v; case _ => null }
              val h = hi match { case JString(v) => v; case _ => null }
              val aboveLo = l == null || e.exactStr && e.maxStr.compareTo(l) >= 0 || !e.exactStr
              val belowHi = h == null || e.minStr.compareTo(h) <= 0
              aboveLo && belowHi
            case _ => true
          }
      }
  }

  final class Handle(val seq: Long, val meta: ComponentMeta, val file: PagedFile,
                     val metaPath: java.io.File) extends ComponentHandle {
    def pageSize: Int = meta.pageSize
    lazy val leaves: Array[LeafInfo] = {
      val in = new BufReader(meta.directory)
      Array.fill(in.readVarInt())(
        LeafInfo(in.readVarInt(), in.readVarInt(), in.readVarInt(), in.readLongLE(), in.readLongLE()))
    }

    def newCursor(datasetSchema: Schema, projection: Array[Int]): CompCursor =
      new Cursor(datasetSchema, projection, null)

    /** Cursor with an optional zone-map predicate: leaves whose min/max
      * prefixes rule the predicate out keep flowing keys (reconciliation
      * still needs them) but are flagged pruned so the scan skips
      * materialization and never touches their data pages.
      */
    def newCursor(datasetSchema: Schema, projection: Array[Int],
                  zoneFilter: ZonePredicate): Cursor = new Cursor(datasetSchema, projection, zoneFilter)

    final class Cursor(datasetSchema: Schema, projection: Array[Int],
                       zoneFilter: ZonePredicate) extends CompCursor {
      private val projCols: Array[ColumnMeta] =
        (if (projection == null) meta.schema.columns.toArray
         else projection.filter(_ < datasetSchema.numColumns).map(datasetSchema.column))

      private var leafIdx = -1
      private var view: LeafView = _
      private var slot = -1
      private var readers: Array[ColumnChunkReader] = _
      private var pendingSkip = 0
      private var materialized = false
      var leafPruned = false
      var key: Long = _
      var isAntimatter: Boolean = _

      def advance(): Boolean = {
        if (view != null && slot >= 0 && !isAntimatter && !materialized) pendingSkip += 1
        materialized = false
        slot += 1
        while (view == null || slot >= view.nRecs) {
          leafIdx += 1
          if (leafIdx >= leaves.length) return false
          view = new LeafView(Handle.this, leaves(leafIdx))
          readers = null
          pendingSkip = 0
          slot = 0
          leafPruned = zoneFilter != null && !zoneFilter.mayMatch(view)
        }
        key = view.keys(slot)
        isAntimatter = view.anti(slot)
        true
      }

      def rowMajor: Boolean = false

      def shapes(): Array[Shape] = {
        require(!isAntimatter, "anti-matter entries have no columns")
        if (readers == null) readers = projCols.map(view.reader)
        if (pendingSkip > 0) { readers.foreach(_.skipRecords(pendingSkip)); pendingSkip = 0 }
        materialized = true
        val out = new Array[Shape](datasetSchema.numColumns)
        var i = 0
        while (i < readers.length) { out(projCols(i).columnId) = readers(i).nextRecordShape(); i += 1 }
        out
      }

      def record(): JObject = {
        val sh = shapes()
        Assembler.assembleRecord(datasetSchema, id => sh(id))
      }
    }

    def pointLookup(key: Long, datasetSchema: Schema,
                    projection: Array[Int] = null): Option[Option[JObject]] = {
      if (meta.numEntries == 0 || key < meta.minKey || key > meta.maxKey) return None
      val cols: Seq[ColumnMeta] =
        if (projection == null) meta.schema.columns
        else projection.filter(_ < datasetSchema.numColumns).map(datasetSchema.column).toSeq
      var lo = 0; var hi = leaves.length - 1
      while (lo <= hi) {
        val mid = (lo + hi) >>> 1
        if (key < leaves(mid).minKey) hi = mid - 1
        else if (key > leaves(mid).maxKey) lo = mid + 1
        else {
          val view = new LeafView(this, leaves(mid))
          val slot = java.util.Arrays.binarySearch(view.keys, key)
          if (slot < 0) return None
          if (view.anti(slot)) return Some(None)
          val skip = (0 until slot).count(i => !view.anti(i))
          val shapes = new Array[Shape](datasetSchema.numColumns)
          cols.foreach { m =>
            val r = view.reader(m)
            r.skipRecords(skip)
            shapes(m.columnId) = r.nextRecordShape()
          }
          return Some(Some(Assembler.assembleRecord(datasetSchema, id => shapes(id))))
        }
      }
      None
    }
  }

  /** Conjunction of per-column range predicates for leaf zone-map pruning. */
  final case class ZonePredicate(ranges: Seq[(ColumnMeta, JValue, JValue)]) {
    def mayMatch(view: LeafView): Boolean =
      ranges.forall { case (m, lo, hi) => view.mayContain(m, lo, hi) }
  }

  def open(seq: Long, dataPath: java.io.File, metaPath: java.io.File, cache: BufferCache): Handle = {
    val meta = ComponentMeta.deserialize(java.nio.file.Files.readAllBytes(metaPath.toPath))
    new Handle(seq, meta, PagedFile.open(dataPath, meta.pageOffsets, cache), metaPath)
  }
}
