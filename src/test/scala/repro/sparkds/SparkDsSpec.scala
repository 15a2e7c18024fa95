package repro.sparkds

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core._
import repro.datasets.Datasets
import repro.lsm._

/** DataSourceV2 integration: Spark reads LSM-columnar datasets with Catalyst
  * on top (whole-stage codegen = the paper's "typed access via compilation"
  * mapped onto Spark), with column pruning and zone-map filter pushdown.
  */
class SparkDsSpec extends SparkSpec {
  private val Fmt = "repro.sparkds.LsmColumnarSource"

  private def build(name: String, layout: LayoutKind, n: Long): String = {
    val dir = java.nio.file.Files.createTempDirectory(s"dsv2-$name-${layout.name}").toFile
    val config = LsmConfig(pageSize = 16 * 1024, memBudgetBytes = 256 * 1024, amaxLeafRecords = 200)
    val ds = new LsmDataset(name, dir, layout, config, new BufferCache(1024))
    Datasets.byName(name, n).foreach(ds.upsert)
    ds.forceFullMerge()
    dir.getAbsolutePath
  }

  private lazy val sensorsAmax = build("sensors", LayoutKind.Amax, 300)
  private lazy val sensorsApax = build("sensors", LayoutKind.Apax, 300)
  private lazy val wosAmax = build("wos", LayoutKind.Amax, 300)
  private lazy val tweetAmax = build("tweet_2", LayoutKind.Amax, 300)

  test("reads back the row count of an AMAX dataset") {
    assert(spark.read.format(Fmt).load(sensorsAmax).count() == 300)
    assert(spark.read.format(Fmt).load(sensorsApax).count() == 300)
  }

  test("scalar columns round-trip through Catalyst (oracle-checked)") {
    val df = spark.read.format(Fmt).load(sensorsAmax)
      .groupBy(col("sensor_id") % 10 as "b")
      .agg(count(lit(1)) as "cnt", max(col("battery")) as "mb")
      .select(col("b"), col("cnt"), col("mb"))
    import spark.implicits._
    val recs = Datasets.sensors(300).toSeq
    val input = spark.createDataFrame(recs.map { r =>
      (r.get("sensor_id").get.asInstanceOf[JLong].v, r.get("battery").get.asInstanceOf[JLong].v)
    }).toDF("sensor_id", "battery")
    Oracle.assertEquivalent(df,
      "SELECT CAST(sensor_id AS BIGINT) % 10 AS b, COUNT(*) AS cnt, MAX(CAST(battery AS BIGINT)) AS mb " +
        "FROM s GROUP BY b",
      "s" -> input)
  }

  test("nested structs and arrays are exposed with Spark types") {
    val df = spark.read.format(Fmt).load(sensorsAmax)
    val row = df.select(col("connectivity.protocol"), size(col("readings")) as "n", col("readings")(0)("temp"))
      .where(col("id") === 5).collect().head
    import spark.implicits._
    val rec = Datasets.sensors(300).drop(5).next()
    assert(row.getString(0) == rec.get("connectivity").get.asInstanceOf[JObject]
      .get("protocol").get.asInstanceOf[JString].v)
    assert(row.getInt(1) == rec.get("readings").get.asInstanceOf[JArray].items.size)
  }

  test("union-typed fields map to kind-tagged structs (wos address_name)") {
    val df = spark.read.format(Fmt).load(wosAmax)
    val an = df.select(col("static_data.fullrecord_metadata.addresses.address_name") as "an")
    import spark.implicits._
    val objCount = an.where(col("an.object").isNotNull).count()
    val arrCount = an.where(col("an.array").isNotNull).count()
    val recs = Datasets.wos(300).toSeq
    def addrOf(r: JObject) = r.get("static_data").get.asInstanceOf[JObject]
      .get("fullrecord_metadata").get.asInstanceOf[JObject]
      .get("addresses").get.asInstanceOf[JObject].get("address_name").get
    assert(objCount == recs.count(r => addrOf(r).isInstanceOf[JObject]))
    assert(arrCount == recs.count(r => addrOf(r).isInstanceOf[JArray]))
    assert(objCount + arrCount == 300)
  }

  test("query equivalence against spark.read.json on the same documents") {
    import spark.implicits._
    val json = spark.read.json(
      Datasets.tweet2(300).map(_.render).toSeq.toDS())
    val ours = spark.read.format(Fmt).load(tweetAmax)
    val a = json.groupBy(col("users.name") as "u").agg(max(length(col("text"))) as "m")
      .collect().map(r => (r.getString(0), r.get(1).asInstanceOf[Number].longValue)).toSet
    val b = ours.groupBy(col("users.name") as "u").agg(max(length(col("text"))) as "m")
      .collect().map(r => (r.getString(0), r.get(1).asInstanceOf[Number].longValue)).toSet
    assert(a == b)
  }

  test("column pruning reads fewer pages than a full scan (AMAX megapages)") {
    val df = spark.read.format(Fmt).load(tweetAmax)
    LsmColumnarSource.io.reset()
    df.select("retweet_count").agg(sum("retweet_count")).collect()
    val pruned = LsmColumnarSource.io.logicalReads
    LsmColumnarSource.io.reset()
    df.agg(sum(length(to_json(struct(df.columns.map(col): _*))))).collect()
    val full = LsmColumnarSource.io.logicalReads
    assert(pruned < full, s"pruned=$pruned full=$full")
  }

  test("filter pushdown prunes AMAX leaves via zone maps") {
    import spark.implicits._
    val df = spark.read.format(Fmt).load(tweetAmax)
    LsmColumnarSource.io.reset()
    val narrow = df.where(col("timestamp") >= 1600000000290L).select("text").collect()
    val narrowReads = LsmColumnarSource.io.logicalReads
    assert(narrow.length == 10)
    LsmColumnarSource.io.reset()
    val all = df.select("text", "timestamp").collect()
    assert(all.length == 300)
    val fullReads = LsmColumnarSource.io.logicalReads
    assert(narrowReads <= fullReads)
  }

  test("count(*) over the source touches only page 0 (no value megapages)") {
    val df = spark.read.format(Fmt).load(sensorsAmax)
    LsmColumnarSource.io.reset()
    assert(df.count() == 300)
    val countReads = LsmColumnarSource.io.logicalReads
    LsmColumnarSource.io.reset()
    df.select("readings").collect()
    val readingsReads = LsmColumnarSource.io.logicalReads
    assert(countReads < readingsReads)
  }
}
