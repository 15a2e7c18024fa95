package repro.datasets

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class DatasetsSpec extends AnyFunSuite {

  test("generators are deterministic in (n, seed)") {
    for (name <- Seq("cell", "sensors", "tweet_1", "tweet_2", "wos")) {
      val a = Datasets.byName(name, 50).map(_.render).toSeq
      val b = Datasets.byName(name, 50).map(_.render).toSeq
      assert(a == b, name)
    }
  }

  test("ids are dense 0..n-1 (primary keys)") {
    for (name <- Seq("cell", "sensors", "tweet_1", "tweet_2", "wos")) {
      val ids = Datasets.byName(name, 30).map(_.get("id").get.asInstanceOf[JLong].v).toSeq
      assert(ids == (0L until 30L), name)
    }
  }

  test("cell is flat 1NF with mixed scalar types") {
    val r = Datasets.cell(5).toSeq.last
    assert(r.fields.forall { case (_, v) => !v.isInstanceOf[JObject] && !v.isInstanceOf[JArray] })
    val kinds = r.fields.map(f => Kind.of(f._2)).toSet
    assert(kinds == Set("long", "string", "double"))
  }

  test("sensors is numeric-dominant with a nested readings array") {
    val r = Datasets.sensors(3).toSeq.last
    val JArray(reads) = r.get("readings").get: @unchecked
    assert(reads.size >= 15)
    reads.foreach { rd =>
      val o = rd.asInstanceOf[JObject]
      assert(o.get("temp").get.isInstanceOf[JDouble])
      assert(o.get("ts").get.isInstanceOf[JLong])
    }
  }

  test("tweets carry a strictly monotone synthetic timestamp") {
    val ts = Datasets.tweet2(100).map(_.get("timestamp").get.asInstanceOf[JLong].v).toSeq
    assert(ts == ts.sorted && ts.distinct == ts)
  }

  test("tweet_1 accumulates far more sparse columns than tweet_2") {
    def columnsOf(it: Iterator[JObject]): Int = {
      val s = new Schema
      it.foreach(r => s.observe(JObject(r.fields.filterNot(_._1 == "id"))))
      s.numColumns
    }
    val c1 = columnsOf(Datasets.tweet1(800))
    val c2 = columnsOf(Datasets.tweet2(800))
    assert(c1 > c2, s"tweet_1=$c1 tweet_2=$c2")
    assert(c1 > 300, "tweet_1 should be a many-column dataset")
  }

  test("wos address_name is heterogeneous: object XOR array-of-objects") {
    val kinds = Datasets.wos(200).map { r =>
      val an = r.get("static_data").get.asInstanceOf[JObject]
        .get("fullrecord_metadata").get.asInstanceOf[JObject]
        .get("addresses").get.asInstanceOf[JObject].get("address_name").get
      Kind.of(an)
    }.toSeq
    assert(kinds.toSet == Set("object", "array"), "both alternatives must occur")
  }

  test("wos abstracts are the long-text values of the corpus") {
    val lens = Datasets.wos(20).map(_.get("abstract").get.asInstanceOf[JString].v.length).toSeq
    assert(lens.forall(_ > 1000), "multi-paragraph abstracts")
  }

  test("hashtag pool includes the popular tag used by tweet Q3") {
    val found = Datasets.tweet2(300).exists { r =>
      val JArray(tags) = r.get("entities").get.asInstanceOf[JObject].get("hashtags").get: @unchecked
      tags.exists(_.asInstanceOf[JObject].get("text").contains(JString("jobs")))
    }
    assert(found)
  }
}
