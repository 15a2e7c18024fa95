package repro.lsm

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class IndexesSpec extends AnyFunSuite {

  test("primary-key index: no false negatives across flushes") {
    val idx = new PrimaryKeyIndex
    (0L until 100L).foreach(idx.insert)
    idx.flush()
    (100L until 150L).foreach(idx.insert)
    (0L until 150L).foreach(k => assert(idx.mayContain(k)))
    assert(!idx.mayContain(999L))
  }

  test("primary-key index compaction preserves membership") {
    val idx = new PrimaryKeyIndex
    (0L until 50L).foreach(idx.insert); idx.flush()
    (25L until 80L).foreach(idx.insert); idx.flush()
    idx.compact()
    (0L until 80L).foreach(k => assert(idx.mayContain(k)))
  }

  test("secondary index: basic range lookup returns sorted PKs") {
    val idx = new SecondaryIndex("ts")
    Seq((10L, 5L), (20L, 3L), (15L, 9L), (30L, 1L)).foreach { case (v, pk) => idx.insert(v, pk) }
    idx.flush()
    assert(idx.rangeLookup(10, 20).toSeq == Seq(3L, 5L, 9L))
    assert(idx.rangeLookup(31, 99).isEmpty)
  }

  test("secondary index: anti-matter entries cancel older inserts") {
    val idx = new SecondaryIndex("ts")
    idx.insert(100L, 1L); idx.insert(100L, 2L)
    idx.flush()
    idx.delete(100L, 1L)
    idx.insert(200L, 1L)
    idx.flush()
    assert(idx.rangeLookup(100, 100).toSeq == Seq(2L))
    assert(idx.rangeLookup(200, 200).toSeq == Seq(1L))
  }

  test("secondary index: compaction drops annihilated pairs") {
    val idx = new SecondaryIndex("ts")
    (0L until 20L).foreach(i => idx.insert(i, i))
    idx.flush()
    (0L until 20L by 2).foreach(i => idx.delete(i, i))
    idx.compact()
    assert(idx.rangeLookup(0, 19).toSeq == (1L until 20L by 2).toSeq)
  }

  test("secondary index extraction follows dotted paths") {
    val idx = new SecondaryIndex("a.b.ts")
    assert(idx.extract(Json.parse("""{"a":{"b":{"ts":42}}}""").asInstanceOf[JObject]).contains(42L))
    assert(idx.extract(Json.parse("""{"a":{}}""").asInstanceOf[JObject]).isEmpty)
    assert(idx.extract(Json.parse("""{"a":{"b":{"ts":"x"}}}""").asInstanceOf[JObject]).isEmpty)
  }
}
