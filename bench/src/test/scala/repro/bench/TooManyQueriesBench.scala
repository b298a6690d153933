package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{Experiments, TableFmt}

/** §2.3 "too many queries" microbenchmark.
  *
  * Paper (1 M unit records, 100 K-record version, Cassandra):
  *   chunk size:      1     10    100   1000  10000
  *   time (secs): 65.42  14.18   3.10   1.07   0.56
  *
  * Scaled ×1/10 (100 K records, 10 K-record version) on the simulated KVS
  * whose cost model is calibrated to the paper's 0.65 ms/request.
  */
class TooManyQueriesBench extends AnyFunSuite {

  private lazy val rows = Experiments.tooManyQueries()

  test("print §2.3 chunk-size table") {
    println(TableFmt.render(
      "Sec 2.3 — version reconstruction time vs chunk size (paper: 65.42 / 14.18 / 3.10 / 1.07 / 0.56 s at 10x scale)",
      Seq("Chunk size", "Chunks fetched", "Time (secs)"),
      rows.map(r => Seq(r.chunkRecords.toString, r.chunksFetched.toString, f"${r.secs}%.3f"))))
  }

  test("time decreases monotonically with chunk size") {
    val t = rows.map(_.secs)
    assert(t.zip(t.tail).forall { case (a, b) => a > b }, t.mkString(", "))
  }

  test("unit chunks issue one request per record of the version") {
    assert(rows.head.chunkRecords == 1)
    assert(rows.head.chunksFetched == 10000)
  }

  test("chunking wins by more than an order of magnitude end to end") {
    // paper: 65.42 / 0.56 ≈ 117x; shape check at scaled size
    assert(rows.head.secs / rows.last.secs > 20,
      f"only ${rows.head.secs / rows.last.secs}%.1fx improvement")
  }

  test("intermediate chunk sizes retrieve extra chunks but fewer requests") {
    val c10 = rows.find(_.chunkRecords == 10).get
    // random assignment: more chunks than the 1000 strictly necessary...
    assert(c10.chunksFetched > 1000)
    // ...but far fewer requests than one per record
    assert(c10.chunksFetched < 10000)
  }
}
