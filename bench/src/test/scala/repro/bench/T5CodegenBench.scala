package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Exhibits

/** Fig 10 — interpreted vs code-generated execution. */
class T5CodegenBench extends AnyFunSuite {
  test("Fig 10: code generation beats the interpreted model") {
    val (rows, lines) = Exhibits.codegen()
    lines.foreach(println)
    def t(q: String, mode: String, l: String) =
      rows.find(r => r.query == s"$q/$mode" && r.layout == l).get.seconds
    // The aggregate query on columnar layouts: codegen avoids full-record
    // assembly; allow slack since absolute times are small at this scale.
    for (l <- Seq("amax", "apax", "vb", "open"))
      assert(t("Q2", "CodeGen", l) < t("Q2", "Interpreted", l) * 1.25,
        s"codegen should not lose clearly on $l")
  }
}
