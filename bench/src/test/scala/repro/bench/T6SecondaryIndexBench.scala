package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Exhibits

/** Fig 15 — range queries through the timestamp secondary index. */
class T6SecondaryIndexBench extends AnyFunSuite {
  test("Fig 15: index-vs-scan behaviour by selectivity") {
    val (rows, lines) = Exhibits.secondaryIndex()
    lines.foreach(println)
    // Counts already cross-checked inside the exhibit (index == scan).
    assert(rows.nonEmpty)
    // Low-selectivity index lookups are sub-second at this scale everywhere.
    rows.filter(r => r.selectivity <= 0.001 && r.mode == "index")
      .foreach(r => assert(r.seconds < 1.0, s"${r.layout} low-sel index too slow"))
  }
}
