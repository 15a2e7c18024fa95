package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

class JsonSpec extends AnyFunSuite {

  test("renders scalars compactly") {
    assert(JLong(42).render == "42")
    assert(JBool(true).render == "true")
    assert(JNull.render == "null")
    assert(JString("hi").render == "\"hi\"")
  }

  test("renders doubles so spark.read.json sees them as doubles") {
    assert(JDouble(1.0).render == "1.0")
    assert(JDouble(2.5).render == "2.5")
  }

  test("escapes control characters and quotes") {
    assert(JString("a\"b\\c\nd\te").render == "\"a\\\"b\\\\c\\nd\\te\"")
    assert(JString("\u0001").render == "\"\\u0001\"")
  }

  test("renders nested structures in field order") {
    val v = JObject.of("b" -> JLong(1), "a" -> JArray.of(JNull, JObject.of()))
    assert(v.render == """{"b":1,"a":[null,{}]}""")
  }

  test("parses what it renders (hand-picked cases)") {
    Seq(
      """{"a":1,"b":[1,2.5,"x",true,null],"c":{"d":{}}}""",
      """{}""",
      """{"s":"\u00e9\n\"q\""}""",
      """{"neg":-12,"exp":1.5E2}""",
    ).foreach { s =>
      val v = Json.parse(s)
      assert(Json.parse(v.render) == v)
    }
  }

  test("parse rejects trailing garbage") {
    intercept[IllegalArgumentException](Json.parse("""{"a":1} extra"""))
  }

  test("property: render/parse round-trips random documents") {
    val leaf: Gen[JValue] = Gen.oneOf(
      Gen.const(JNull),
      Gen.choose(-1000000L, 1000000L).map(JLong(_)),
      Gen.choose(-100.0, 100.0).map(d => JDouble(math.rint(d * 16) / 16)),
      Gen.alphaNumStr.map(s => JString(s.take(8))),
      Gen.oneOf(true, false).map(JBool(_)))
    def value(depth: Int): Gen[JValue] =
      if (depth == 0) leaf
      else Gen.frequency(
        3 -> leaf,
        1 -> Gen.listOf(Gen.lzy(value(depth - 1))).map(x => JArray(x.take(4).toVector)),
        1 -> Gen.listOf(Gen.zip(Gen.identifier.map(_.take(5)), Gen.lzy(value(depth - 1))))
          .map(fs => JObject(fs.take(4).distinctBy(_._1).toVector)))
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(80),
      Prop.forAll(value(3))(v => Json.parse(v.render) == v))
    assert(res.passed, res.status.toString)
  }

  test("spark.read.json compatible rendering of generator output") {
    val doc = repro.datasets.Datasets.wos(1).next()
    assert(Json.parse(doc.render) == doc)
  }
}
