package repro.lsm

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.datasets.Datasets

/** System-level pieces: read-only opening (the DSV2 path), the shared
  * transaction log, merge-concurrency governance, and multi-partition
  * ingestion (§2.1.1's partitions sharing one NC's resources).
  */
class SystemSpec extends AnyFunSuite {

  private def cfg = LsmConfig(pageSize = 16 * 1024, memBudgetBytes = 128 * 1024,
    amaxLeafRecords = 200, maxComponents = 3)

  test("openReadOnly restores components, schema, and data") {
    val dir = java.nio.file.Files.createTempDirectory("ro").toFile
    val ds = new LsmDataset("ro", dir, LayoutKind.Amax, cfg, new BufferCache(512))
    Datasets.wos(150).foreach(ds.upsert)
    ds.flush()
    val reopened = LsmDataset.openReadOnly(dir, new BufferCache(512))
    assert(reopened.layout == LayoutKind.Amax)
    assert(reopened.schema.numColumns == ds.schema.numColumns)
    assert(reopened.scan().size == 150)
    val a = ds.scan().map(t => RoundTrip.normalize(t.record())).toVector
    val b = reopened.scan().map(t => RoundTrip.normalize(t.record())).toVector
    assert(a == b)
  }

  test("openReadOnly keeps newest-wins ordering across unmerged components") {
    val dir = java.nio.file.Files.createTempDirectory("ro2").toFile
    val ds = new LsmDataset("ro2", dir, LayoutKind.Apax,
      cfg.copy(maxComponents = 10), new BufferCache(512))
    (0L until 50L).foreach(i => ds.upsert(JObject.of("id" -> JLong(i), "v" -> JString("old"))))
    ds.flush()
    (0L until 50L by 2).foreach(i => ds.upsert(JObject.of("id" -> JLong(i), "v" -> JString("new"))))
    ds.flush()
    val ro = LsmDataset.openReadOnly(dir, new BufferCache(512))
    val vs = ro.scan().map(t => t.key -> t.record().get("v").get).toMap
    (0L until 50L).foreach { i =>
      assert(vs(i) == JString(if (i % 2 == 0) "new" else "old"), s"key $i")
    }
  }

  test("transaction log survives wrap-around and counts appends") {
    val log = new TxLog(bufferBytes = 256)
    (0 until 100).foreach(i => log.append(Array.fill[Byte](33)(i.toByte)))
    assert(log.appended == 100)
  }

  test("merge governor serializes columnar merges at partitions/2 permits") {
    MergeGovernor.configure(partitions = 2) // 1 permit
    val active = new java.util.concurrent.atomic.AtomicInteger(0)
    val maxSeen = new java.util.concurrent.atomic.AtomicInteger(0)
    val threads = (1 to 4).map { _ =>
      new Thread(() => MergeGovernor.withPermit(columnar = true) {
        val a = active.incrementAndGet()
        maxSeen.getAndUpdate(m => math.max(m, a))
        Thread.sleep(20)
        active.decrementAndGet()
      })
    }
    threads.foreach(_.start()); threads.foreach(_.join())
    assert(maxSeen.get() == 1, "only one concurrent columnar merge allowed")
    MergeGovernor.unlimited()
    // Row merges are never gated.
    MergeGovernor.configure(partitions = 2)
    var ran = false
    MergeGovernor.withPermit(columnar = false) { ran = true }
    assert(ran)
    MergeGovernor.unlimited()
  }

  test("four partitions ingest concurrently against a shared tx log") {
    val txLog = new TxLog()
    val cache = new BufferCache(1024)
    val partitions = (0 until 4).map { p =>
      new LsmDataset(s"part$p", java.nio.file.Files.createTempDirectory(s"part$p").toFile,
        LayoutKind.Amax, cfg, cache, txLog = txLog)
    }
    val recs = Datasets.cell(4000).toArray
    val threads = partitions.zipWithIndex.map { case (ds, p) =>
      new Thread(() => {
        recs.foreach { r =>
          val JLong(k) = r.get("id").get: @unchecked
          if (k % 4 == p) ds.upsert(r) // hash-partition by PK
        }
        ds.flush()
      })
    }
    threads.foreach(_.start()); threads.foreach(_.join())
    assert(partitions.map(_.scan().size).sum == 4000)
    assert(txLog.appended == 4000)
    // Partition-local key disjointness
    val keys = partitions.flatMap(_.scan().map(_.key))
    assert(keys.distinct.size == 4000)
  }

  test("size accounting sums components plus index runs") {
    val dir = java.nio.file.Files.createTempDirectory("sz").toFile
    val ds = new LsmDataset("sz", dir, LayoutKind.VB, cfg, new BufferCache(256),
      enablePkIndex = true)
    ds.secondaries += new SecondaryIndex("start_time")
    Datasets.cell(500).foreach(ds.upsert)
    ds.flush()
    assert(ds.sizeOnDisk > ds.components.map(_.sizeOnDisk).sum,
      "indexes must contribute to the total footprint")
  }
}
