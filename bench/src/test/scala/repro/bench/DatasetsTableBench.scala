package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{BottomUpPartitioner, SubChunker}
import repro.data.DatasetSpec
import repro.exp.{Experiments, TableFmt}
import repro.index.ChunkIndexes

/** Table 2 — the scaled datasets next to the paper's originals.
  *
  * Scaling (DESIGN.md §5): versions ÷10, records/version ÷50, record size
  * ÷4; all dimensionless knobs (update %, update type, depth/versions
  * ratio) preserved. The paper's values are embedded below so the bench
  * output shows both side by side.
  */
class DatasetsTableBench extends AnyFunSuite {

  /** name → (versions, avgDepth, recsPerVersion, updatePct, type, uniqueRecords, uniqueGB, totalGB) */
  private val paper: Map[String, (Int, Double, Int, Int, String, Long, Double, Double)] = Map(
    "A0" -> (300, 300.0, 100000, 50, "Random", 12355366L, 11.9, 31.67),
    "A1" -> (300, 300.0, 100000, 5, "Skewed", 1510097L, 5.77, 140.14),
    "A2" -> (300, 300.0, 100000, 5, "Random", 1343434L, 5.14, 141.26),
    "B0" -> (1001, 293.5, 100000, 5, "Skewed", 4175023L, 8.0, 192.24),
    "B1" -> (1001, 293.5, 100000, 5, "Random", 4216366L, 8.07, 193.77),
    "B2" -> (1001, 293.5, 100000, 10, "Random", 8349864L, 8.02, 195.69),
    "C0" -> (10001, 143.0, 20000, 10, "Random", 16532342L, 15.95, 196.46),
    "C1" -> (10001, 143.0, 20000, 1, "Random", 1758517L, 1.69, 193.01),
    "C2" -> (10001, 143.0, 20000, 5, "Skewed", 8169026L, 7.87, 193.05),
    "D0" -> (10002, 94.4, 20000, 10, "Random", 16621314L, 16.03, 196.48),
    "D1" -> (10002, 94.4, 20000, 1, "Random", 1773281L, 1.71, 193.07),
    "D2" -> (10002, 94.4, 20000, 5, "Skewed", 8195193L, 7.90, 193.09),
    "E" -> (10001, 170.0, 20000, 10, "Random", 16524584L, 78.96, 972.84),
    "F" -> (1001, 56.0, 100000, 20, "Random", 16665072L, 79.64, 981.11),
  )

  private lazy val stats = Experiments.datasetsTable()

  test("print Table 2 (scaled measured vs paper)") {
    println(TableFmt.render(
      "Table 2 — datasets: measured (scaled x1/10 versions, x1/50 records) | paper",
      Seq("Dataset", "#ver", "#ver(p)", "depth", "depth(p)", "recs/v", "recs/v(p)",
        "%upd", "Type", "#unique", "#unique(p)", "uniq MB", "uniq GB(p)", "tot MB", "tot GB(p)"),
      stats.map { s =>
        val p = paper(s.name)
        Seq(s.name, s.nVersions.toString, p._1.toString, f"${s.avgDepth}%.1f", p._2.toString,
          f"${s.avgRecordsPerVersion}%.0f", p._3.toString, f"${s.updatePct}%.0f", s.updateType,
          s.uniqueRecords.toString, p._6.toString, TableFmt.mb(s.uniqueBytes), p._7.toString,
          TableFmt.mb(s.totalBytes), p._8.toString)
      }))
  }

  test("tree shapes track the paper: chains stay chains, branched sets stay bushy, ordering kept") {
    // A/B preserve the paper's depth/versions ratio; C/D/E/F deliberately
    // keep depth closer to the paper's *absolute* depth so the delta-path
    // versus chunks-per-version cost structure (which drives Figs 8-13)
    // survives the x1/10 version scaling — see EXPERIMENTS.md.
    def ratio(n: String) = { val s = stats.find(_.name == n).get; s.avgDepth / s.nVersions }
    Seq("A0", "A1", "A2").foreach(n => assert(math.abs(ratio(n) - 1.0) < 1e-9, n))
    Seq("B0", "B1", "B2").foreach { n =>
      assert(ratio(n) > 0.293 * 0.7 && ratio(n) < 0.293 * 1.45, s"$n: ${ratio(n)}")
    }
    // C/D stay far bushier than A/B with C deeper than D (paper: 143 vs 94);
    // E and F keep the paper's *absolute* depths (170 and 56)
    Seq("C0", "D0").foreach(n => assert(ratio(n) < 0.1, s"$n: ${ratio(n)}"))
    assert(ratio("C0") > ratio("D0"), "paper orders C deeper than D")
    def depth(n: String) = stats.find(_.name == n).get.avgDepth
    assert(math.abs(depth("E") - 170.0) < 170 * 0.3, s"E depth ${depth("E")}")
    assert(math.abs(depth("F") - 56.0) < 56 * 0.3, s"F depth ${depth("F")}")
  }

  test("update percentage and type match the paper") {
    stats.foreach { s =>
      val p = paper(s.name)
      assert(s.updatePct.round.toInt == p._4, s.name)
      assert(s.updateType == p._5, s.name)
    }
  }

  test("relative unique-record counts across datasets follow the paper") {
    // C0 (10% updates) has ~9x the unique records of C1 (1%); A1/A2 are close
    def uniq(n: String) = stats.find(_.name == n).get.uniqueRecords.toDouble
    assert(uniq("C0") / uniq("C1") > 5)
    assert(uniq("D0") / uniq("D1") > 5)
    assert(math.abs(uniq("A1") / uniq("A2") - 1.0) < 0.2)
    assert(uniq("A0") > 5 * uniq("A2")) // 50% vs 5% updates
  }

  test("dedup factor (total/unique) is large for low-update datasets, like the paper") {
    // paper C1: 193 GB total vs 1.69 GB unique (~114x); scaled keeps the shape
    def s(n: String) = stats.find(_.name == n).get
    assert(s("C1").totalBytes / s("C1").uniqueBytes > 20)
    assert(s("A0").totalBytes / s("A0").uniqueBytes < 5) // 50% churn dedups little
  }

  test("§2.4 index-size remark: indexes are tiny relative to C0's deduplicated data") {
    val ds = Experiments.dataset(DatasetSpec.C0)
    val sub = SubChunker.build(ds, 1)
    val a = new BottomUpPartitioner().partition(sub.input, Experiments.DefaultCapacity)
    val idx = ChunkIndexes.build(ds, sub, a)
    val dataMB = ds.itemSizes.sum / 1048576.0
    println(TableFmt.render(
      "Sec 2.4 — C0 index sizes (paper: version-chunk 11.25 MB, key-chunk 25-75 MB vs 16 GB data)",
      Seq("Index", "Size KB", "Data MB"),
      Seq(
        Seq("version->chunk", TableFmt.kb(idx.versionIndexBytes), f"$dataMB%.1f"),
        Seq("key->chunk", TableFmt.kb(idx.keyIndexBytes), f"$dataMB%.1f"))))
    // paper: 11.25 MB vs 16 GB ≈ 0.07%; allow an order of magnitude at small scale
    assert(idx.versionIndexBytes < ds.itemSizes.sum / 50)
    assert(idx.keyIndexBytes < ds.itemSizes.sum)
  }
}
