package repro.query

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import repro.{Oracle, SparkSpec}
import repro.core._
import repro.datasets.Datasets
import repro.lsm._
import repro.queries.Queries
import scala.collection.mutable

/** End-to-end query correctness: every Table-2 query runs identically across
  * all four layouts and both execution modes, and grouped variants are
  * checked against DuckDB via the oracle.
  */
class EngineSpec extends SparkSpec {

  private val N = 400L
  private val dsCache = mutable.Map.empty[(String, String), LsmDataset]

  private def dataset(name: String, layout: LayoutKind): LsmDataset =
    dsCache.getOrElseUpdate((name, layout.name), {
      val dir = java.nio.file.Files.createTempDirectory(s"eng-$name-${layout.name}").toFile
      val config = LsmConfig(pageSize = 16 * 1024, memBudgetBytes = 128 * 1024,
        amaxLeafRecords = 120, maxComponents = 4)
      val ds = new LsmDataset(name, dir, layout, config, new BufferCache(1024))
      Datasets.byName(name, N).foreach(ds.upsert)
      ds.flush()
      ds
    })

  private def canonical(r: QueryResult): Set[String] =
    r.rows.map(_.map(_.render).mkString("|")).toSet

  private def resultToDF(r: QueryResult): DataFrame = {
    def sparkVal(v: JValue): Any = v match {
      case JLong(l) => l; case JDouble(d) => d; case JString(s) => s
      case JBool(b) => b; case JNull => null
      case other => other.render
    }
    val fields = r.columns.zipWithIndex.map { case (c, i) =>
      val t = r.rows.iterator.map(_(i)).collectFirst {
        case JLong(_) => LongType
        case JDouble(_) => DoubleType
        case JBool(_) => BooleanType
        case JString(_) => StringType
      }.getOrElse(StringType)
      StructField(c, t, nullable = true)
    }
    val rows = r.rows.map(row => Row.fromSeq(row.map(sparkVal)))
    spark.createDataFrame(java.util.Arrays.asList(rows: _*), StructType(fields))
  }

  private def flatDF(cols: Seq[String], rows: Seq[Seq[Any]]): DataFrame = {
    val schema = StructType(cols.map(StructField(_, StringType, nullable = true)))
    spark.createDataFrame(
      java.util.Arrays.asList(rows.map(r => Row.fromSeq(r.map(v => if (v == null) null else v.toString))): _*),
      schema)
  }

  private val datasetsAndQueries = Seq(
    "cell"    -> Seq("Q1", "Q2g", "Q3"),
    "sensors" -> Seq("Q1", "Q2", "Q3g", "Q4g"),
    "tweet_1" -> Seq("Q1", "Q2g", "Q3g"),
    "tweet_2" -> Seq("Q1", "Q2g", "Q3g"),
    "wos"     -> Seq("Q1", "Q2g", "Q3g", "Q4g"))

  private def planOf(ds: String, q: String): PlanSpec = (ds, q) match {
    case (_, "Q1") if ds != "sensors" => Queries.pureCount
    case ("cell", "Q2g")    => Queries.cellQ2Grouped
    case ("cell", "Q3")     => Queries.cellQ3
    case ("sensors", "Q1")  => Queries.sensorsQ1
    case ("sensors", "Q2")  => Queries.sensorsQ2
    case ("sensors", "Q3g") => Queries.sensorsQ3Grouped
    case ("sensors", "Q4g") => Queries.sensorsQ4Grouped(1556400000000L + 100L * 3600)
    case (("tweet_1" | "tweet_2"), "Q2g") => Queries.tweetQ2Grouped
    case (("tweet_1" | "tweet_2"), "Q3g") => Queries.tweetQ3Grouped
    case ("wos", "Q2g") => Queries.wosQ2Grouped
    case ("wos", "Q3g") => Queries.wosQ3Grouped
    case ("wos", "Q4g") => Queries.wosQ4Grouped
  }

  // 1. Cross-layout, cross-mode equality -------------------------------

  for ((dsName, qs) <- datasetsAndQueries; q <- qs) {
    test(s"$dsName/$q: identical results across layouts and execution modes") {
      val plan = planOf(dsName, q)
      val reference = canonical(Engine.run(dataset(dsName, LayoutKind.Open), plan, ExecMode.Interpreted))
      assert(reference.nonEmpty || q == "none")
      for (layout <- LayoutKind.all; mode <- Seq(ExecMode.Interpreted, ExecMode.CodeGen)) {
        val got = canonical(Engine.run(dataset(dsName, layout), plan, mode))
        assert(got == reference, s"layout=${layout.name} mode=$mode")
      }
    }
  }

  // 2. DuckDB oracle verification --------------------------------------

  test("oracle: cell Q2/Q3 grouped results match DuckDB") {
    val recs = Datasets.cell(N).toSeq
    val input = flatDF(Seq("caller", "duration"),
      recs.map(r => Seq(r.get("caller").get.asInstanceOf[JString].v,
        r.get("duration").get.asInstanceOf[JLong].v)))
    val q2 = Engine.run(dataset("cell", LayoutKind.Amax), Queries.cellQ2Grouped, ExecMode.CodeGen)
    Oracle.assertEquivalent(resultToDF(q2),
      "SELECT caller, MAX(CAST(duration AS BIGINT)) AS m FROM cell GROUP BY caller",
      "cell" -> input)
    val q3 = Engine.run(dataset("cell", LayoutKind.Amax), Queries.cellQ3, ExecMode.CodeGen)
    Oracle.assertEquivalent(resultToDF(q3),
      "SELECT COUNT(*) AS cnt FROM cell WHERE CAST(duration AS BIGINT) >= 600",
      "cell" -> input)
  }

  test("oracle: sensors Q1-Q3 match DuckDB over the unnested readings") {
    val recs = Datasets.sensors(N).toSeq
    val flat = for {
      r <- recs
      JArray(reads) = r.get("readings").get: @unchecked
      rd <- reads
    } yield Seq(
      r.get("sensor_id").get.asInstanceOf[JLong].v,
      r.get("report_time").get.asInstanceOf[JLong].v,
      rd.asInstanceOf[JObject].get("temp").get.asInstanceOf[JDouble].v)
    val input = flatDF(Seq("sensor_id", "report_time", "temp"), flat)
    val amax = dataset("sensors", LayoutKind.Amax)
    Oracle.assertEquivalent(resultToDF(Engine.run(amax, Queries.sensorsQ1, ExecMode.CodeGen)),
      "SELECT COUNT(*) AS cnt FROM readings", "readings" -> input)
    Oracle.assertEquivalent(resultToDF(Engine.run(amax, Queries.sensorsQ2, ExecMode.CodeGen)),
      "SELECT MAX(CAST(temp AS DOUBLE)) AS mx, MIN(CAST(temp AS DOUBLE)) AS mn FROM readings",
      "readings" -> input)
    Oracle.assertEquivalent(resultToDF(Engine.run(amax, Queries.sensorsQ3Grouped, ExecMode.CodeGen)),
      "SELECT CAST(sensor_id AS BIGINT) AS sid, MAX(CAST(temp AS DOUBLE)) AS max_temp " +
        "FROM readings GROUP BY sid", "readings" -> input)
  }

  test("oracle: tweet Q2/Q3 match DuckDB over flattened tweets") {
    val recs = Datasets.tweet2(N).toSeq
    def uname(r: JObject) = r.get("users").get.asInstanceOf[JObject].get("name").get.asInstanceOf[JString].v
    def textLen(r: JObject) = r.get("text").get.asInstanceOf[JString].v.length.toLong
    def hasJobs(r: JObject) = {
      val JArray(tags) = r.get("entities").get.asInstanceOf[JObject].get("hashtags").get: @unchecked
      tags.exists(_.asInstanceOf[JObject].get("text").contains(JString("jobs")))
    }
    val input = flatDF(Seq("uname", "textlen", "has_jobs"),
      recs.map(r => Seq(uname(r), textLen(r), hasJobs(r))))
    val amax = dataset("tweet_2", LayoutKind.Amax)
    Oracle.assertEquivalent(resultToDF(Engine.run(amax, Queries.tweetQ2Grouped, ExecMode.CodeGen)),
      "SELECT uname, MAX(CAST(textlen AS BIGINT)) AS a FROM tw GROUP BY uname", "tw" -> input)
    Oracle.assertEquivalent(resultToDF(Engine.run(amax, Queries.tweetQ3Grouped, ExecMode.CodeGen)),
      "SELECT uname, COUNT(*) AS c FROM tw WHERE has_jobs = 'true' GROUP BY uname", "tw" -> input)
  }

  test("oracle: wos Q2/Q3 match DuckDB over flattened publications") {
    val recs = Datasets.wos(N).toSeq
    def meta(r: JObject) = r.get("static_data").get.asInstanceOf[JObject]
      .get("fullrecord_metadata").get.asInstanceOf[JObject]
    val subjRows = for {
      r <- recs
      JArray(subs) = meta(r).get("category_info").get.asInstanceOf[JObject]
        .get("subjects").get.asInstanceOf[JObject].get("subject").get: @unchecked
      s <- subs
      o = s.asInstanceOf[JObject]
    } yield Seq(o.get("ascatype").get.asInstanceOf[JString].v, o.get("value").get.asInstanceOf[JString].v)
    val subjInput = flatDF(Seq("ascatype", "v"), subjRows)
    val amax = dataset("wos", LayoutKind.Amax)
    Oracle.assertEquivalent(resultToDF(Engine.run(amax, Queries.wosQ2Grouped, ExecMode.CodeGen)),
      "SELECT v, COUNT(*) AS cnt FROM subj WHERE ascatype = 'extended' GROUP BY v",
      "subj" -> subjInput)

    // Q3: countries co-publishing with USA (computed over the union-typed
    // address_name: array = multi-author, object = single-author).
    val countryRows = for {
      r <- recs
      an = meta(r).get("addresses").get.asInstanceOf[JObject].get("address_name").get
      if an.isInstanceOf[JArray]
      countries = an.asInstanceOf[JArray].items
        .map(_.asInstanceOf[JObject].get("address_spec").get.asInstanceOf[JObject]
          .get("country").get.asInstanceOf[JString].v).distinct
      if countries.length > 1 && countries.contains("USA")
      c <- countries if c != "USA"
    } yield Seq(c)
    val cInput = flatDF(Seq("country"), countryRows)
    Oracle.assertEquivalent(resultToDF(Engine.run(amax, Queries.wosQ3Grouped, ExecMode.CodeGen)),
      "SELECT country, COUNT(*) AS cnt FROM c GROUP BY country", "c" -> cInput)
  }

  // 3. Pushdown behaviour ----------------------------------------------

  test("AMAX zone maps prune leaves for the sensors time-range query without changing results") {
    val amax = dataset("sensors", LayoutKind.Amax)
    amax.forceFullMerge()
    val plan = Queries.sensorsQ4Grouped(1556400000000L + 100L * 3600)
    assert(Engine.zonePredicate(amax, plan) != null, "range filter must yield a zone predicate")
    val open = dataset("sensors", LayoutKind.Open)
    assert(canonical(Engine.run(amax, plan, ExecMode.CodeGen)) ==
           canonical(Engine.run(open, plan, ExecMode.Interpreted)))
  }

  test("pure-count plans project zero columns") {
    val amax = dataset("cell", LayoutKind.Amax)
    val cols = Engine.neededColumns(amax, Queries.pureCount)
    assert(cols != null && cols.isEmpty)
  }

  test("projection analysis pulls only referenced subtrees") {
    val ds = dataset("cell", LayoutKind.Amax)
    val cols = Engine.neededColumns(ds, Queries.cellQ2Grouped)
    val paths = cols.map(ds.schema.column(_).path).toSet
    assert(paths == Set("caller", "duration"))
  }
}
