package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.DatasetSpec
import repro.exp.{Experiments, TableFmt}

/** Fig 9 — effect of the subtree-size bound β on BOTTOM-UP (dataset B0).
  *
  * Paper: span increases as β shrinks; wall time first drops with smaller β
  * (less processing per version) and rises again for very small β (merge
  * overhead dominates).
  */
class BetaSweepBench extends AnyFunSuite {

  private val betas = Seq(5, 10, 20, 40, 80, Int.MaxValue)
  private lazy val rows = Experiments.betaSweep(DatasetSpec.B0, betas)

  test("print Fig 9 beta sweep (B0)") {
    println(TableFmt.render(
      "Fig 9 — BottomUp subtree limit sweep on B0 (paper: span grows as beta shrinks)",
      Seq("beta", "Total span", "Wall secs"),
      rows.map(r => Seq(if (r.beta == Int.MaxValue) "inf" else r.beta.toString,
        r.totalSpan.toString, f"${r.wallSecs}%.3f"))))
  }

  test("span never improves when beta shrinks") {
    // compare each restricted run against the unrestricted one
    val unrestricted = rows.last.totalSpan
    rows.foreach(r => assert(r.totalSpan >= unrestricted, s"beta=${r.beta}"))
  }

  test("smallest beta has the worst span") {
    assert(rows.head.totalSpan >= rows.last.totalSpan)
    assert(rows.head.totalSpan > rows.last.totalSpan * 0.99)
  }

  test("all runs complete within interactive time") {
    rows.foreach(r => assert(r.wallSecs < 30, s"beta=${r.beta} took ${r.wallSecs}s"))
  }
}
