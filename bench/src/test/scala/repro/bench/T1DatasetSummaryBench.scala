package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Exhibits

/** Table 1 — dataset summary (scaled synthetic stand-ins). */
class T1DatasetSummaryBench extends AnyFunSuite {
  test("Table 1: dataset characteristics match the paper's structure") {
    val (rows, lines) = Exhibits.table1()
    lines.foreach(println)
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("cell").nColumns == 7, "cell is 1NF with 7 columns")
    assert(byName("cell").dominant == "Mix")
    assert(byName("sensors").dominant == "Integer" || byName("sensors").dominant == "Double")
    assert(byName("tweet_1").nColumns > byName("wos").nColumns,
      "tweet_1 has the most inferred columns")
    assert(byName("tweet_1").nColumns > byName("tweet_2").nColumns)
    Seq("tweet_1", "tweet_2", "wos").foreach(n => assert(byName(n).dominant == "String"))
    assert(byName("cell").avgRecord < byName("sensors").avgRecord,
      "cell records are the smallest")
  }
}
