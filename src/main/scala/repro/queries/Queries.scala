package repro.queries

import repro.core._
import repro.query._

/** The evaluation queries of Table 2 / Appendix A as [[PlanSpec]]s.
  *
  * `*Grouped` variants drop ORDER BY/LIMIT so correctness tests can compare
  * complete group results against Spark/DuckDB without top-k tie ambiguity;
  * the bench variants keep the paper's LIMIT 10 shape.
  */
object Queries {
  import Expr.path

  private def count(as: String = "cnt") = Agg("count", null, as)

  val pureCount: PlanSpec =
    PlanSpec(Nil, group = Some(GroupSpec(Nil, Seq(count()))))

  // ------------------------------------------------------------------ cell

  /** Q1: SELECT VALUE COUNT(*) FROM Cell */
  val cellQ1: PlanSpec = pureCount

  /** Q2: top 10 callers with the longest call durations */
  val cellQ2: PlanSpec = cellQ2Grouped.copy(orderBy = Some(("m", true)), limit = Some(10))
  lazy val cellQ2Grouped: PlanSpec = PlanSpec(
    Nil,
    group = Some(GroupSpec(Seq("caller" -> path("t.caller")), Seq(Agg("max", path("t.duration"), "m")))))

  /** Q3: COUNT(*) WHERE duration >= 600 */
  val cellQ3: PlanSpec = PlanSpec(
    List(FilterOp(Cmp(">=", path("t.duration"), Lit(JLong(600))))),
    group = Some(GroupSpec(Nil, Seq(count()))))

  // --------------------------------------------------------------- sensors

  /** Q1: COUNT(*) FROM Sensors s, s.readings r */
  val sensorsQ1: PlanSpec = PlanSpec(
    List(UnnestOp(path("t.readings"), "r")),
    group = Some(GroupSpec(Nil, Seq(count()))))

  /** Q2: MAX(r.temp), MIN(r.temp) */
  val sensorsQ2: PlanSpec = PlanSpec(
    List(UnnestOp(path("t.readings"), "r")),
    group = Some(GroupSpec(Nil, Seq(
      Agg("max", path("r.temp"), "mx"), Agg("min", path("r.temp"), "mn")))))

  /** Q3: top 10 sensors by max reading */
  val sensorsQ3: PlanSpec = sensorsQ3Grouped.copy(orderBy = Some(("max_temp", true)), limit = Some(10))
  lazy val sensorsQ3Grouped: PlanSpec = PlanSpec(
    List(UnnestOp(path("t.readings"), "r")),
    group = Some(GroupSpec(Seq("sid" -> path("t.sensor_id")),
      Seq(Agg("max", path("r.temp"), "max_temp")))))

  /** Q4: Q3 restricted to one day of report_time (zone-map friendly). */
  def sensorsQ4(dayStart: Long): PlanSpec = sensorsQ4Grouped(dayStart)
    .copy(orderBy = Some(("max_temp", true)), limit = Some(10))
  def sensorsQ4Grouped(dayStart: Long): PlanSpec = PlanSpec(
    List(
      FilterOp(And(
        Cmp(">", path("t.report_time"), Lit(JLong(dayStart))),
        Cmp("<", path("t.report_time"), Lit(JLong(dayStart + 24L * 60 * 60 * 1000))))),
      UnnestOp(path("t.readings"), "r")),
    group = Some(GroupSpec(Seq("sid" -> path("t.sensor_id")),
      Seq(Agg("max", path("r.temp"), "max_temp")))))

  // ---------------------------------------------------------------- tweets

  val tweetQ1: PlanSpec = pureCount

  /** Q2: top 10 users who posted the longest tweets */
  val tweetQ2: PlanSpec = tweetQ2Grouped.copy(orderBy = Some(("a", true)), limit = Some(10))
  lazy val tweetQ2Grouped: PlanSpec = PlanSpec(
    Nil,
    group = Some(GroupSpec(Seq("uname" -> path("t.users.name")),
      Seq(Agg("max", Func("length", List(path("t.text"))), "a")))))

  /** Q3: top 10 users by #tweets containing the popular hashtag */
  val tweetQ3: PlanSpec = tweetQ3Grouped.copy(orderBy = Some(("c", true)), limit = Some(10))
  lazy val tweetQ3Grouped: PlanSpec = PlanSpec(
    List(FilterOp(ExistsIn(path("t.entities.hashtags"), "ht",
      Cmp("==", Func("lowercase", List(path("ht.text"))), Lit(JString("jobs")))))),
    group = Some(GroupSpec(Seq("uname" -> path("t.users.name")), Seq(count("c")))))

  // ------------------------------------------------------------------- wos

  val wosQ1: PlanSpec = pureCount

  private val subjectsPath = path("t.static_data.fullrecord_metadata.category_info.subjects.subject")
  private val addressPath = path("t.static_data.fullrecord_metadata.addresses.address_name")

  /** Q2: top 10 scientific fields by publication count */
  val wosQ2: PlanSpec = wosQ2Grouped.copy(orderBy = Some(("cnt", true)), limit = Some(10))
  lazy val wosQ2Grouped: PlanSpec = PlanSpec(
    List(
      UnnestOp(subjectsPath, "subject"),
      FilterOp(Cmp("==", path("subject.ascatype"), Lit(JString("extended"))))),
    group = Some(GroupSpec(Seq("v" -> path("subject.value")), Seq(count()))))

  /** Q3: top 10 countries co-publishing with US institutes (union-typed
    * address_name exercised here, §6.4.4).
    */
  val wosQ3: PlanSpec = wosQ3Grouped.copy(orderBy = Some(("cnt", true)), limit = Some(10))
  lazy val wosQ3Grouped: PlanSpec = PlanSpec(
    List(
      AssignOp("countries", Func("array_distinct",
        List(Func("field_each", List(addressPath, Lit(JString("address_spec.country"))))))),
      FilterOp(And(And(
        Func("is_array", List(addressPath)),
        Cmp(">", Func("array_count", List(Var("countries"))), Lit(JLong(1)))),
        Func("array_contains", List(Var("countries"), Lit(JString("USA")))))),
      UnnestOp(Var("countries"), "country"),
      FilterOp(Cmp("!=", Var("country"), Lit(JString("USA"))))),
    group = Some(GroupSpec(Seq("country" -> Var("country")), Seq(count()))))

  /** Q4: top 10 country pairs by co-published articles */
  val wosQ4: PlanSpec = wosQ4Grouped.copy(orderBy = Some(("cnt", true)), limit = Some(10))
  lazy val wosQ4Grouped: PlanSpec = PlanSpec(
    List(
      AssignOp("countries", Func("array_distinct",
        List(Func("field_each", List(addressPath, Lit(JString("address_spec.country"))))))),
      FilterOp(And(
        Func("is_array", List(addressPath)),
        Cmp(">", Func("array_count", List(Var("countries"))), Lit(JLong(1))))),
      AssignOp("pairs", Func("array_pairs", List(Var("countries")))),
      UnnestOp(Var("pairs"), "pair")),
    group = Some(GroupSpec(Seq("pair" -> Var("pair")), Seq(count()))))

  /** Bench registry: dataset → (query name → plan). */
  def forDataset(name: String): Seq[(String, PlanSpec)] = name match {
    case "cell"    => Seq("Q1" -> cellQ1, "Q2" -> cellQ2, "Q3" -> cellQ3)
    case "sensors" => Seq("Q1" -> sensorsQ1, "Q2" -> sensorsQ2, "Q3" -> sensorsQ3,
                          "Q4" -> sensorsQ4(1556400000000L + 1000L * 3600))
    case "tweet_1" | "tweet_2" => Seq("Q1" -> tweetQ1, "Q2" -> tweetQ2, "Q3" -> tweetQ3)
    case "wos"     => Seq("Q1" -> wosQ1, "Q2" -> wosQ2, "Q3" -> wosQ3, "Q4" -> wosQ4)
  }
}
