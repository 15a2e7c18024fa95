package repro.lsm

import java.util.concurrent.Semaphore

/** Shared transaction-log buffer. All partitions of a node append commit
  * entries under one lock — the contention §6.3.1 identifies as the cell
  * dataset's ingestion bottleneck (high record cardinality ⇒ log-bound).
  */
final class TxLog(bufferBytes: Int = 1 << 20) {
  private val buf = new Array[Byte](bufferBytes)
  private var pos = 0
  var appended = 0L

  def append(entry: Array[Byte]): Unit = synchronized {
    var off = 0
    while (off < entry.length) {
      val n = math.min(entry.length - off, buf.length - pos)
      System.arraycopy(entry, off, buf, pos, n)
      pos += n; off += n
      if (pos == buf.length) pos = 0 // "force" the full buffer and wrap
    }
    appended += 1
  }
}

/** Caps concurrent columnar merges at partitions/2 (§4.5.3: decode+encode
  * during concurrent merges saturated the CPU; the paper limits merge
  * concurrency for APAX/AMAX). Row-layout merges are not gated.
  */
object MergeGovernor {
  @volatile private var sem = new Semaphore(Int.MaxValue)

  def configure(partitions: Int): Unit =
    sem = new Semaphore(math.max(1, partitions / 2))
  def unlimited(): Unit = sem = new Semaphore(Int.MaxValue)

  def withPermit[T](columnar: Boolean)(f: => T): T =
    if (!columnar) f
    else {
      sem.acquire()
      try f finally sem.release()
    }
}
