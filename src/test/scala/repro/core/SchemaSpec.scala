package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.encoding.AtomicType

class SchemaSpec extends AnyFunSuite {

  private def obj(s: String): JObject = Json.parse(s).asInstanceOf[JObject]

  test("flat record infers one column per scalar field with level 1") {
    val s = new Schema
    s.observe(obj("""{"a": 1, "b": "x", "c": 1.5, "d": true}"""))
    assert(s.numColumns == 4)
    assert(s.columns.map(_.tpe) == Seq(AtomicType.TLong, AtomicType.TString, AtomicType.TDouble, AtomicType.TBool))
    assert(s.columns.forall(_.maxDef == 1))
    assert(s.columns.map(_.path) == Seq("a", "b", "c", "d"))
  }

  test("nested object fields get one level per object step (Figure 4's name.first)") {
    val s = new Schema
    s.observe(obj("""{"name": {"first": "John", "last": "Smith"}}"""))
    assert(s.column(0).path == "name.first")
    assert(s.column(0).maxDef == 2)
  }

  test("array columns record ancestor array levels and max-delimiter") {
    val s = new Schema
    s.observe(obj("""{"games": [{"title": "NFL", "consoles": ["PC", "PS4"]}]}"""))
    val title = s.columns.find(_.path == "games.[*].title").get
    // 3-level lists: games(1), slot(2), element object(3), title(4)
    assert(title.maxDef == 4)
    assert(title.arrayLevels == Vector(1))
    assert(title.maxDelimiter == 0)
    val consoles = s.columns.find(_.path == "games.[*].consoles.[*]").get
    // consoles array at level 4, slot 5, string value 6
    assert(consoles.maxDef == 6)
    assert(consoles.arrayLevels == Vector(1, 4))
    assert(consoles.maxDelimiter == 1)
  }

  test("type change creates a union whose alternatives keep their levels (§3.2.2)") {
    val s = new Schema
    s.observe(obj("""{"name": "John"}"""))
    assert(s.numColumns == 1)
    assert(s.column(0).maxDef == 1)
    s.observe(obj("""{"name": {"first": "Ann", "last": "Brown"}}"""))
    assert(s.numColumns == 3)
    // Union is logical: the original string column's level is unchanged.
    assert(s.column(0).maxDef == 1)
    assert(s.columns.find(_.path == "name.object.first").get.maxDef == 2)
    val un = s.root.fields("name").asInstanceOf[UnionNode]
    assert(un.alternatives.keySet == Set("string", "object"))
  }

  test("heterogeneous array elements form element-level unions (Figure 6's games)") {
    val s = new Schema
    s.observe(obj("""{"games": ["NBA", ["FIFA", "PES"], "NFL"]}"""))
    s.observe(obj("""{"games": ["Halo", "NFL"]}"""))
    // The string alternative IS the original pre-union column: injecting the
    // union changed neither its id, its path label, nor its levels (§3.2.2).
    val stringAlt = s.columns.find(_.path == "games.[*]").get
    assert(stringAlt.maxDef == 3) // games(1), slot(2), string-at-item(3)
    val innerAlt = s.columns.find(_.path == "games.[*].array.[*]").get
    assert(innerAlt.maxDef == 5) // inner array(3), slot(4), value(5)
    assert(innerAlt.arrayLevels == Vector(1, 3))
    assert(innerAlt.maxDelimiter == 1)
  }

  test("column ids are stable and append-only across observations") {
    val s = new Schema
    s.observe(obj("""{"a": 1}"""))
    s.observe(obj("""{"a": 1, "b": 2}"""))
    s.observe(obj("""{"b": "now-a-string", "c": 3}"""))
    assert(s.columns.map(m => (m.columnId, m.path)) ==
      Seq((0, "a"), (1, "b"), (2, "b.string"), (3, "c")))
  }

  test("JSON null carries no type evidence") {
    val s = new Schema
    s.observe(obj("""{"a": null, "b": [null, null]}"""))
    assert(s.numColumns == 0)
    s.observe(obj("""{"a": 7}"""))
    assert(s.numColumns == 1)
    assert(s.column(0).tpe == AtomicType.TLong)
  }

  test("serialization round-trips structure, levels, and column ids") {
    val s = new Schema
    s.observe(obj("""{"name": "John", "games": ["NBA", ["FIFA"]], "n": {"x": 1}}"""))
    s.observe(obj("""{"name": {"first": "Ann"}, "tags": [{"t": "a"}]}"""))
    val s2 = Schema.deserialize(s.serialize())
    assert(s2.numColumns == s.numColumns)
    assert(s2.columns == s.columns)
    val rendered = s.columns.map(_.path)
    assert(Schema.deserialize(s2.serialize()).columns.map(_.path) == rendered)
  }

  test("maxDefOverall covers the deepest column") {
    val s = new Schema
    s.observe(obj("""{"a": {"b": {"c": [{"d": 1}]}}}"""))
    val d = s.columns.find(_.path == "a.b.c.[*].d").get
    assert(s.maxDefOverall == d.maxDef)
  }
}
