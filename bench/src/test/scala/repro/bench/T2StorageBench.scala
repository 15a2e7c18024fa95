package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Exhibits

/** Fig 12a — on-disk storage size after ingestion, per layout. */
class T2StorageBench extends AnyFunSuite {
  test("Fig 12a: storage-size ordering follows the paper") {
    val (rows, lines) = Exhibits.storage()
    lines.foreach(println)
    def size(ds: String, l: String) = rows.find(r => r.dataset == ds && r.layout == l).get.bytes
    // cell: columnar < row-major; VB < Open
    assert(size("cell", "vb") < size("cell", "open"))
    assert(size("cell", "amax") < size("cell", "open"))
    assert(size("cell", "apax") < size("cell", "open"))
    // sensors (numeric): columnar encodings win by a large factor
    assert(size("sensors", "open").toDouble / size("sensors", "amax") > 2.0,
      "numeric encodings should beat row-major by a clear factor")
    assert(size("sensors", "vb") > size("sensors", "amax"))
    // tweet_1 (many sparse columns): APAX suffers, AMAX does not
    assert(size("tweet_1", "apax") > size("tweet_1", "amax"),
      "minipage overhead should hurt APAX on the many-column dataset")
    // wos/tweet_2: Open is the largest layout
    Seq("wos", "tweet_2*").foreach { d =>
      assert(Seq("vb", "apax", "amax").forall(l => size(d, l) < size(d, "open")),
        s"$d: Open should be largest")
    }
  }
}
