package repro.encoding

import org.xerial.snappy.Snappy

/** Page-level compression, matching the paper's setup (Snappy on every
  * on-disk data page for all four layouts, §6 Experiment Setup).
  *
  * Frame: `[rawLen: 4B LE][compressedLen: 4B LE][snappy bytes]`, so readers
  * can size buffers and storage accounting can report both raw and
  * compressed footprints.
  */
object PageCompressor {
  val HeaderBytes = 8

  def compress(raw: Array[Byte]): Array[Byte] = {
    val comp = Snappy.compress(raw)
    val out = new BufWriter(comp.length + HeaderBytes)
    out.writeIntLE(raw.length)
    out.writeIntLE(comp.length)
    out.writeBytes(comp)
    out.toArray
  }

  def decompress(framed: Array[Byte]): Array[Byte] = {
    val in = new BufReader(framed)
    val rawLen = in.readIntLE()
    val compLen = in.readIntLE()
    val out = new Array[Byte](rawLen)
    Snappy.uncompress(framed, in.position, compLen, out, 0)
    out
  }
}
