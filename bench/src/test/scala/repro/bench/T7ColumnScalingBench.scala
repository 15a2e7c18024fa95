package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Exhibits

/** Fig 16 — cost of accessing 1..10 columns, scan-based and index-based. */
class T7ColumnScalingBench extends AnyFunSuite {
  test("Fig 16: AMAX scan cost grows with accessed columns; APAX stays flat") {
    val (rows, lines) = Exhibits.columnScaling()
    lines.foreach(println)
    def io(l: String, k: Int) =
      rows.find(r => r.layout == l && r.mode == "scan" && r.k == k).get.logicalReads
    // AMAX: more columns ⇒ more megapages read.
    assert(io("amax", 10) > io("amax", 1), "AMAX I/O must grow with accessed columns")
    // APAX: page count identical regardless of projection.
    assert(io("apax", 10) == io("apax", 1), "APAX reads whole pages either way")
    // AMAX still reads less than APAX even at 10 columns (paper's Fig 16a).
    assert(io("amax", 10) <= io("apax", 10))
  }
}
