package repro.datasets

import repro.core._
import java.util.Random

/** Deterministic synthetic stand-ins for the paper's five datasets
  * (Table 1). Each generator matches the structural characteristics that
  * drive the paper's results — record shape, nesting, dominant value types,
  * column counts (scaled), heterogeneity — not the proprietary content
  * (DESIGN.md substitution 3).
  */
object Datasets {

  private val Words = Array(
    "analysis", "signal", "network", "quantum", "storage", "column", "merge", "index",
    "stream", "vector", "format", "schema", "record", "tuple", "query", "engine",
    "flush", "cache", "page", "batch", "delta", "union", "document", "system",
    "data", "model", "graph", "learn", "optimal", "sparse", "dense", "encode")

  private def word(r: Random): String = Words(r.nextInt(Words.length))
  private def sentence(r: Random, n: Int): String =
    (0 until n).map(_ => word(r)).mkString(" ")

  // ------------------------------------------------------------------ cell

  /** Flat 1NF telecom records: 7 columns, small (~140 B), mixed scalar types. */
  def cell(n: Long, seed: Long = 101): Iterator[JObject] =
    Iterator.range(0L, n).map { i =>
      val r = new Random(seed * 7919 + i)
      JObject.of(
        "id" -> JLong(i),
        "caller" -> JString("c" + r.nextInt(200000)),
        "callee" -> JString("c" + r.nextInt(200000)),
        "duration" -> JLong(r.nextInt(1200).toLong),
        "tower" -> JString("T" + r.nextInt(500)),
        "signal" -> JDouble((r.nextInt(600) - 900) / 10.0),
        "start_time" -> JLong(1500000000000L + i * 977 + r.nextInt(500)),
      )
    }

  // --------------------------------------------------------------- sensors

  /** Numeric-dominant sensor reports with a nested readings array (16 cols). */
  def sensors(n: Long, seed: Long = 202): Iterator[JObject] =
    Iterator.range(0L, n).map { i =>
      val r = new Random(seed * 7919 + i)
      val nReads = 15 + r.nextInt(25)
      JObject.of(
        "id" -> JLong(i),
        "sensor_id" -> JLong(r.nextInt(5000).toLong),
        "report_time" -> JLong(1556400000000L + i * 3600),
        "battery" -> JLong(r.nextInt(101).toLong),
        "signal" -> JDouble(r.nextDouble() * -90),
        "temp_calibration" -> JDouble(r.nextDouble()),
        "fw_version" -> JString("v" + r.nextInt(9)),
        "lat" -> JDouble(r.nextDouble() * 180 - 90),
        "lon" -> JDouble(r.nextDouble() * 360 - 180),
        "flags" -> JLong(r.nextInt(16).toLong),
        "connectivity" -> JObject.of(
          "rssi" -> JLong((-30 - r.nextInt(70)).toLong),
          "protocol" -> JString(if (r.nextBoolean()) "lora" else "nbiot"),
          "channel" -> JLong(r.nextInt(64).toLong)),
        "status" -> JObject.of(
          "uptime" -> JLong(r.nextInt(1000000).toLong),
          "errors" -> JLong(r.nextInt(10).toLong)),
        "readings" -> JArray((0 until nReads).map { k =>
          JObject.of(
            "temp" -> JDouble(-20 + r.nextDouble() * 70),
            "ts" -> JLong(1556400000000L + i * 3600 + k * 60)): JValue
        }.toVector),
      )
    }

  // ---------------------------------------------------------------- tweets

  private val Hashtags = Array("jobs", "news", "sports", "music", "love", "win",
    "tech", "food", "travel", "game", "art", "cats")

  /** String-heavy nested tweets. `extraPool`/`extraPerRecord` control the
    * sparse-column blow-up: tweet_1 ≈ many sparse columns (933 in the
    * paper), tweet_2 ≈ moderate (275). `timestamp` is synthetic and
    * monotone, as the paper's secondary-index experiments require.
    */
  def tweets(n: Long, seed: Long, extraPool: Int, extraPerRecord: Int,
             textWords: Int): Iterator[JObject] =
    Iterator.range(0L, n).map { i =>
      val r = new Random(seed * 7919 + i)
      val nTags = r.nextInt(4)
      val base = Vector[(String, JValue)](
        "id" -> JLong(i),
        "created_at" -> JLong(1600000000000L + i * 131),
        "timestamp" -> JLong(1600000000000L + i),
        "text" -> JString(sentence(r, textWords / 7 + r.nextInt(5))),
        "lang" -> JString(if (r.nextInt(10) < 7) "en" else "es"),
        "source" -> JString("app" + r.nextInt(5)),
        "users" -> JObject.of(
          "id" -> JLong(r.nextInt(100000).toLong),
          "name" -> JString("user" + r.nextInt(20000)),
          "screen_name" -> JString("u" + r.nextInt(20000)),
          "followers_count" -> JLong(r.nextInt(100000).toLong),
          "verified" -> JBool(r.nextInt(50) == 0),
          "location" -> JString(word(r) + " city")),
        "entities" -> JObject.of(
          "hashtags" -> JArray((0 until nTags).map { _ =>
            JObject.of("text" -> JString(Hashtags(r.nextInt(Hashtags.length)))): JValue
          }.toVector),
          "urls" -> JArray(
            if (r.nextInt(3) == 0) Vector(JObject.of("url" -> JString("https://x/" + word(r))): JValue)
            else Vector.empty)),
        "retweet_count" -> JLong(r.nextInt(1000).toLong),
        "favorite_count" -> JLong(r.nextInt(5000).toLong),
        "place" -> JObject.of(
          "country" -> JString(Countries(r.nextInt(Countries.length))),
          "name" -> JString(word(r))),
      )
      val extras = (0 until extraPerRecord).map { _ =>
        val k = r.nextInt(extraPool)
        s"ext$k" -> (if (k % 3 == 0) JLong(r.nextInt(1000).toLong)
                     else JString(word(r)): JValue)
      }.distinctBy(_._1)
      JObject(base ++ extras)
    }

  def tweet1(n: Long, seed: Long = 303): Iterator[JObject] =
    tweets(n, seed, extraPool = 600, extraPerRecord = 12, textWords = 240)

  def tweet2(n: Long, seed: Long = 404): Iterator[JObject] =
    tweets(n, seed, extraPool = 220, extraPerRecord = 8, textWords = 120)

  // ------------------------------------------------------------------- wos

  private val Countries = Array("USA", "China", "Germany", "UK", "Japan", "France",
    "Canada", "Italy", "Spain", "Brazil", "India", "Australia", "Korea", "Netherlands")
  private val Subjects = Array("Computer Science", "Physics", "Chemistry", "Biology",
    "Mathematics", "Engineering", "Medicine", "Economics", "Materials", "Neuroscience")

  /** Web-of-Science-like article metadata: long text values (abstracts) and
    * heterogeneous fields from XML→JSON conversion — `address_name` is a
    * union of an object (single author) and an array of objects (§6.1).
    */
  def wos(n: Long, seed: Long = 505): Iterator[JObject] =
    Iterator.range(0L, n).map { i =>
      val r = new Random(seed * 7919 + i)
      val nAuthors = 1 + r.nextInt(6)
      def addr(): JValue = JObject.of(
        "address_spec" -> JObject.of(
          "country" -> JString(Countries(r.nextInt(Countries.length))),
          "org" -> JString(word(r) + " university")))
      val addressName: JValue =
        if (nAuthors == 1) addr()
        else JArray((0 until nAuthors).map(_ => addr()).toVector)
      val nSubjects = 2 + r.nextInt(4)
      // Sparse metadata fields (identifiers, funding, headings, …): the
      // XML→JSON conversion produced ~296 columns in the paper's corpus.
      val extras = (0 until 5).map { _ =>
        val k = r.nextInt(150)
        s"meta_$k" -> (if (k % 4 == 0) JLong(r.nextInt(100000).toLong)
                       else JString(sentence(r, 3)): JValue)
      }.distinctBy(_._1)
      JObject(Vector[(String, JValue)](
        "id" -> JLong(i),
        "title" -> JString(sentence(r, 12)),
        "abstract" -> JString(sentence(r, 280 + r.nextInt(320))),
        "year" -> JLong(1980 + r.nextInt(35).toLong),
        "authors" -> JArray((0 until nAuthors).map(_ => JString("a. " + word(r)): JValue).toVector),
        "static_data" -> JObject.of(
          "fullrecord_metadata" -> JObject.of(
            "category_info" -> JObject.of(
              "subjects" -> JObject.of(
                "subject" -> JArray((0 until nSubjects).map { k =>
                  JObject.of(
                    "ascatype" -> JString(if (k % 2 == 0) "extended" else "traditional"),
                    "value" -> JString(Subjects(r.nextInt(Subjects.length)))): JValue
                }.toVector))),
            "addresses" -> JObject.of("address_name" -> addressName))),
      ) ++ extras)
    }

  /** Generator registry for the benches (name → (records at bench scale, iterator)). */
  def byName(name: String, n: Long): Iterator[JObject] = name match {
    case "cell"    => cell(n)
    case "sensors" => sensors(n)
    case "tweet_1" => tweet1(n)
    case "tweet_2" => tweet2(n)
    case "wos"     => wos(n)
  }
}
