package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.DatasetSpec
import repro.exp.{Experiments, TableFmt}

/** Fig 13 — online partitioning quality: ratio of online to offline total
  * version span at checkpoints, for several batch sizes (BOTTOM-UP).
  *
  * Paper (scaled ×1/10 here):
  *   B1: batch 125: 1.13/1.36/1.52/1.63; batch 250: 1.00/1.12/1.23/1.32;
  *       batch 500: 1.00/-/1.10
  *   C1: batch 1250: 1.04/1.05/1.06/1.08; batch 2500: ≈1.00-1.02;
  *       batch 5000: ≈1.00
  * Shape: ratios ≥ ~1, degrade as more versions arrive, improve with
  * larger batches; C1 (small deltas) suffers much less than B1.
  */
class OnlineBench extends AnyFunSuite {

  private lazy val b1 = Experiments.onlineQuality(DatasetSpec.B1,
    Seq(25, 50, 100), Seq(50, 100, 150, 200))
  private lazy val c1 = Experiments.onlineQuality(DatasetSpec.C1,
    Seq(125, 250, 500), Seq(250, 500, 750, 1000))

  test("print Fig 13 online partitioning tables") {
    for ((name, rows, batches, checks) <- Seq(
        ("B1", b1, Seq(25, 50, 100), Seq(50, 100, 150, 200)),
        ("C1", c1, Seq(125, 250, 500), Seq(250, 500, 750, 1000)))) {
      println(TableFmt.render(
        s"Fig 13 — online/offline span ratio ($name; paper B1 batch125: 1.13-1.63, C1 batch1250: 1.04-1.08)",
        "Batch" +: checks.map(c => s"@$c versions"),
        batches.map { b =>
          b.toString +: checks.map { c =>
            rows.find(r => r.batchSize == b && r.versions == c)
              .map(r => f"${r.ratio}%.3f").getOrElse("-")
          }
        }))
    }
  }

  test("online never beats offline by more than noise") {
    (b1 ++ c1).foreach(r => assert(r.ratio > 0.9, r.toString))
  }

  test("larger batches give better (lower) ratios at the final checkpoint") {
    def finalRatios(rows: Seq[Experiments.OnlineRow], checkpoint: Int) =
      rows.filter(_.versions == checkpoint).sortBy(_.batchSize).map(_.ratio)
    val rb = finalRatios(b1, 200)
    assert(rb.last <= rb.head * 1.05, s"B1 final ratios $rb")
    val rc = finalRatios(c1, 1000)
    assert(rc.last <= rc.head * 1.05, s"C1 final ratios $rc")
  }

  test("quality degrades (ratio grows) as versions accumulate at the smallest batch") {
    val smallB = b1.filter(_.batchSize == 25).sortBy(_.versions).map(_.ratio)
    assert(smallB.last >= smallB.head * 0.98, s"B1 batch=25 ratios $smallB")
  }

  test("penalties are modest overall (paper: ≤1.63 worst case)") {
    (b1 ++ c1).foreach(r => assert(r.ratio < 2.5, r.toString))
  }

  test("worst-case penalty stays within the paper's envelope (1.63 + scale noise)") {
    // the paper's worst reported ratio is 1.63 (B1, batch 125); at our scale
    // the worst case moves to C1 (offline BottomUp is strongest there) but
    // stays within the same envelope — see EXPERIMENTS.md for the deviation
    val worst = (b1 ++ c1).map(_.ratio).max
    assert(worst < 1.63 * 1.15, s"worst ratio $worst")
  }
}
