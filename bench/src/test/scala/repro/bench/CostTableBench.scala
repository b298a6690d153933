package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{Experiments, TableFmt}

/** Table 1 — measured storage/retrieval costs of the four baseline layouts
  * on a pure-update chain, next to the paper's closed-form expressions
  * evaluated on the same parameters (n=60, m′=2000, d=5 %, s≈256 B,
  * s_c=32 KB, measured compression ratio c).
  */
class CostTableBench extends AnyFunSuite {

  private lazy val rows = Experiments.costTable()

  test("print Table 1 (measured | formula)") {
    println(TableFmt.render(
      "Table 1 — baseline costs on a chain (measured vs closed form)",
      Seq("Approach", "Storage MB", "Storage(f) MB", "Ver MB", "Ver #q",
        "Ver MB(f)", "Ver #q(f)", "Pt KB", "Pt #q"),
      rows.map(r => Seq(r.approach, TableFmt.mb(r.storage),
        TableFmt.mb(r.storageFormula.toLong), TableFmt.mb(r.versionBytes),
        r.versionQueries.toString, TableFmt.mb(r.versionBytesFormula.toLong),
        f"${r.versionQueriesFormula}%.0f", TableFmt.kb(r.pointBytes),
        r.pointQueries.toString))))
  }

  test("measured values track the closed forms within 2x") {
    rows.foreach { r =>
      assert(r.storage / r.storageFormula > 0.5 && r.storage / r.storageFormula < 2.0,
        s"${r.approach} storage off: ${r.storage} vs ${r.storageFormula}")
    }
  }

  test("storage ordering: Delta ≈ SubChunk < Single-address < Independent") {
    def s(n: String) = rows.find(_.approach == n).get.storage
    assert(s("Delta") < s("Single-address space"))
    assert(s("SubChunk") < s("Single-address space"))
    assert(s("Single-address space") < s("Independent w/chunking"))
  }

  test("version-retrieval queries: chunked needs orders of magnitude fewer than per-record layouts") {
    def q(n: String) = rows.find(_.approach == n).get.versionQueries
    assert(q("Independent w/chunking") * 20 < q("Single-address space"))
    assert(q("Independent w/chunking") * 20 < q("SubChunk"))
  }

  test("point queries: delta is the only layout needing many requests") {
    def p(n: String) = rows.find(_.approach == n).get.pointQueries
    assert(p("Delta") > 5)
    assert(p("SubChunk") == 1 && p("Single-address space") == 1)
    assert(p("Independent w/chunking") == 1)
  }
}
