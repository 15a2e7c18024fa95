package repro.query

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.lsm._

/** Heterogeneous-type query semantics over all four layouts: the paper's
  * `{"age": 25}` vs `{"age": "old"}` example (§3.2.2, §5).
  */
class HeteroQuerySpec extends AnyFunSuite {

  private def mk(layout: LayoutKind): LsmDataset = {
    val dir = java.nio.file.Files.createTempDirectory(s"het-${layout.name}").toFile
    val ds = new LsmDataset("het", dir, layout,
      LsmConfig(pageSize = 8 * 1024, memBudgetBytes = 32 * 1024, amaxLeafRecords = 50),
      new BufferCache(256))
    (0L until 200L).foreach { i =>
      val age: JValue =
        if (i % 3 == 0) JLong(20 + i % 50)
        else if (i % 3 == 1) JString("old")
        else JNull
      ds.upsert(JObject.of("id" -> JLong(i), "age" -> age, "name" -> JString(s"p$i")))
    }
    ds.flush()
    ds
  }

  for (layout <- LayoutKind.all; mode <- Seq(ExecMode.Interpreted, ExecMode.CodeGen)) {
    test(s"[${layout.name}/$mode] numeric filter silently skips non-numeric union values") {
      val ds = mk(layout)
      // age > 30: strings and nulls compare to NULL → filtered out.
      val plan = PlanSpec(
        List(FilterOp(Cmp(">", Expr.path("t.age"), Lit(JLong(30))))),
        group = Some(GroupSpec(Nil, Seq(Agg("count", null, "cnt")))))
      val got = Engine.run(ds, plan, mode).rows.head.head
      val expected = (0L until 200L).count(i => i % 3 == 0 && (20 + i % 50) > 30)
      assert(got == JLong(expected.toLong))
    }

    test(s"[${layout.name}/$mode] string filter selects only the string alternative") {
      val ds = mk(layout)
      val plan = PlanSpec(
        List(FilterOp(Cmp("==", Expr.path("t.age"), Lit(JString("old"))))),
        group = Some(GroupSpec(Nil, Seq(Agg("count", null, "cnt")))))
      val got = Engine.run(ds, plan, mode).rows.head.head
      assert(got == JLong((0L until 200L).count(_ % 3 == 1).toLong))
    }
  }

  test("union values survive an LSM merge and keep their runtime types") {
    val ds = mk(LayoutKind.Amax)
    ds.forceFullMerge()
    val ages = ds.scan().map(_.record().get("age").getOrElse(JNull)).toVector
    assert(ages.count(_.isInstanceOf[JLong]) == (0L until 200L).count(_ % 3 == 0))
    assert(ages.count(_ == JString("old")) == (0L until 200L).count(_ % 3 == 1))
    assert(ages.count(_ == JNull) == (0L until 200L).count(_ % 3 == 2))
  }
}
