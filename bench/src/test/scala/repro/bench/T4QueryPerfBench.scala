package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Exhibits

/** Fig 14 — Table-2 queries per layout under the code-generated engine. */
class T4QueryPerfBench extends AnyFunSuite {
  test("Fig 14: scan-query I/O and timing shape follows the paper") {
    val (rows, lines) = Exhibits.queryPerf()
    lines.foreach(println)
    def io(ds: String, q: String, l: String) =
      rows.find(r => r.dataset == ds && r.query == q && r.layout == l).get.logicalReads
    // Q1 (count) on AMAX touches only Page 0s: far fewer pages than APAX.
    for (ds <- Seq("cell", "sensors", "tweet_1", "wos"))
      assert(io(ds, "Q1", "amax") < io(ds, "Q1", "apax"),
        s"$ds Q1: AMAX count must read fewer pages than APAX")
    // Projecting queries on the wide datasets: AMAX reads least.
    assert(io("tweet_1", "Q2", "amax") < io("tweet_1", "Q2", "open"))
    assert(io("wos", "Q2", "amax") < io("wos", "Q2", "open"))
  }
}
