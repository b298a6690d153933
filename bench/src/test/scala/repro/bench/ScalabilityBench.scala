package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.DatasetSpec
import repro.exp.{Experiments, TableFmt}

/** Fig 12 — weak scalability: cluster sizes 1→16, data doubling with the
  * cluster (versions ∝ nodes), BOTTOM-UP layout on the simulated KVS.
  *
  * Paper (dataset G): Q1 7.35→11.39 s, avg version span 508→702;
  *       (dataset H): Q1 61.8→78.9 s, avg version span 400→595;
  * Q3 stays sub-second-ish with slowly growing key spans. The headline
  * result is *weak scalability*: query times grow slowly (driven by span
  * growth), not linearly with data size.
  */
class ScalabilityBench extends AnyFunSuite {

  private val nodes = Seq(1, 2, 4, 8, 12, 16)
  private lazy val g = Experiments.scalability(DatasetSpec.G(_), nodes)
  private lazy val h = Experiments.scalability(DatasetSpec.H(_), nodes)

  test("print Fig 12 scalability tables") {
    for ((name, rows, paperQ1, paperSpan) <- Seq(
        ("G", g, "7.35→11.39s", "508→702"),
        ("H", h, "61.8→78.9s", "400→595"))) {
      println(TableFmt.render(
        s"Fig 12 — weak scalability, dataset $name (paper Q1: $paperQ1, span: $paperSpan)",
        Seq("#nodes", "Q1 secs", "Avg version span", "Q3 secs", "Avg key span"),
        rows.map(r => Seq(r.nodes.toString, f"${r.q1Secs}%.3f", f"${r.avgVersionSpan}%.1f",
          f"${r.q3Secs}%.5f", f"${r.avgKeySpan}%.1f"))))
    }
  }

  test("average version span grows with the dataset (both G and H)") {
    Seq(g, h).foreach { rows =>
      assert(rows.last.avgVersionSpan > rows.head.avgVersionSpan,
        s"${rows.head.avgVersionSpan} -> ${rows.last.avgVersionSpan}")
    }
  }

  test("Q1 time grows sub-linearly in data size (weak scalability)") {
    Seq(g, h).foreach { rows =>
      val growth = rows.last.q1Secs / rows.head.q1Secs
      // data grows 16x; paper's Q1 grows ~1.55x (G) and ~1.28x (H)
      assert(growth < 6.0, f"Q1 grew ${growth}%.2fx for 16x data")
      assert(growth > 1.0, f"Q1 should grow with span, got ${growth}%.2fx")
    }
  }

  test("Q3 stays far cheaper than Q1 (paper: ~0.5s vs 7-78s)") {
    (g ++ h).foreach { r =>
      assert(r.q3Secs < r.q1Secs / 3, s"${r.datasetName}: Q3 ${r.q3Secs} vs Q1 ${r.q1Secs}")
    }
  }

  test("key spans are much smaller than version spans (paper: 21-46 vs 500-700)") {
    (g ++ h).foreach { r =>
      assert(r.avgKeySpan < r.avgVersionSpan / 3, s"${r.datasetName}@${r.nodes}")
    }
  }
}
