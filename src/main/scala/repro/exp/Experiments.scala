package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.{DatasetSpec, RecordModel, VersionedDataGen}
import repro.index.ChunkIndexes
import repro.kvs.{Blob, CostModel, SimulatedKVS}
import repro.online.OnlinePartitioner
import repro.query.QueryProcessor

import scala.collection.mutable
import scala.util.Random

/** One function per table of the paper's evaluation; shared by the `jobs/`
  * entrypoints and the `bench/` suites. Paper-vs-measured values are
  * recorded in EXPERIMENTS.md.
  */
object Experiments {

  /** Scaled analogue of the paper's 1 MB chunk (DESIGN.md §5). */
  val DefaultCapacity: Long = 32 * 1024

  /** A dataset cache so benches sharing a spec generate it once. */
  private val cache = mutable.HashMap.empty[DatasetSpec, VersionedDataset]
  def dataset(spec: DatasetSpec): VersionedDataset =
    cache.synchronized(cache.getOrElseUpdate(spec, VersionedDataGen.generate(spec)))

  def partitioners(spark: SparkSession): Seq[Partitioner] = Seq(
    new BottomUpPartitioner(),
    new ShinglePartitioner(spark),
    TraversalPartitioner.dfs,
    TraversalPartitioner.bfs,
  )

  // -------------------------------------------------------------------------
  // §2.3 — the "too many queries" microbenchmark
  // -------------------------------------------------------------------------

  final case class TooManyQueriesRow(chunkRecords: Int, chunksFetched: Long, secs: Double)

  /** Reconstruct one version (a `versionRecords`-sized random subset of
    * `totalRecords` unit records) from a KVS holding chunks of
    * `chunkRecords` records each, under *random* record→chunk assignment
    * (the paper's §2.3 setup, scaled ×1/10).
    */
  def tooManyQueries(
      chunkSizes: Seq[Int] = Seq(1, 10, 100, 1000, 10000),
      totalRecords: Int = 100000,
      versionRecords: Int = 10000,
      recordBytes: Int = 100,
      seed: Long = 17L): Seq[TooManyQueriesRow] = {
    val rnd = new Random(seed)
    val versionSet = rnd.shuffle((0 until totalRecords).toVector).take(versionRecords)
    chunkSizes.map { c =>
      val perm = rnd.shuffle((0 until totalRecords).toVector) // random assignment
      val chunkOf = new Array[Int](totalRecords)
      perm.zipWithIndex.foreach { case (rec, pos) => chunkOf(rec) = pos / c }
      val kvs = new SimulatedKVS(1, CostModel())
      val numChunks = (totalRecords + c - 1) / c
      (0 until numChunks).foreach { id =>
        val recs = math.min(c, totalRecords - id * c)
        kvs.put(id.toLong, Blob(recs.toLong * recordBytes))
      }
      val needed = versionSet.map(chunkOf).distinct
      kvs.multiGet(needed.map(_.toLong))
      TooManyQueriesRow(c, needed.size.toLong, kvs.timeSecs(kvs.tally))
    }
  }

  // -------------------------------------------------------------------------
  // Table 1 — analytical cost comparison, measured
  // -------------------------------------------------------------------------

  final case class CostRow(
      approach: String,
      storage: Long, storageFormula: Double,
      versionBytes: Long, versionQueries: Long,
      versionBytesFormula: Double, versionQueriesFormula: Double,
      pointBytes: Long, pointQueries: Long)

  /** Measure the Table-1 costs on a pure-update chain and evaluate the
    * paper's closed-form expressions on the same parameters.
    */
  def costTable(
      n: Int = 60, m: Int = 2000, d: Double = 0.05,
      meanSize: Int = 256, capacity: Long = DefaultCapacity,
      seed: Long = 11L): Seq[CostRow] = {
    // pure-update chain: every change is a modification (Table 1's model)
    val spec = DatasetSpec("T1chain", n, m, d, skewed = false, numBranches = 1,
      meanRecordSize = meanSize, seed = seed)
    val ds = chainPureUpdates(spec)
    val s = ds.itemSizes.sum.toDouble / ds.uniqueCks.length // measured avg record size
    val mv = m.toDouble
    // measured compression: avg diff size / avg record size
    val c = ds.uniqueCks.filter(ds.lineage(_).isDefined)
      .map(RecordModel.diffSize(_, spec)).sum.toDouble /
      math.max(1, ds.uniqueCks.count(ds.lineage(_).isDefined)) / s
    val rnd = new Random(seed)
    val versions = Seq.fill(20)(rnd.nextInt(n))
    def avg(xs: Seq[Long]): Long = xs.sum / xs.length

    val indep = new IndependentChunkedLayout(ds, capacity)
    val delta = new DeltaLayout(ds, capacity)
    val sub = new SubChunkLayout(ds)
    val single = new SingleAddressLayout(ds)
    val points = versions.map { v =>
      val live = ds.members(v)
      (v, Ck.key(live(rnd.nextInt(live.length))))
    }

    Seq(
      CostRow("Independent w/chunking",
        indep.storageBytes, n * mv * s,
        avg(versions.map(indep.versionCost(_).bytes)), avg(versions.map(indep.versionCost(_).queries)),
        mv * s, mv * s / capacity,
        indep.pointCost.bytes, indep.pointCost.queries),
      CostRow("Delta",
        delta.storageBytes, mv * s + c * d * (n - 1) * mv * s,
        avg(versions.map(delta.versionCost(_).bytes)), avg(versions.map(delta.versionCost(_).queries)),
        mv * s + c * d * (n - 1) * mv * s / 2, n / 2.0,
        avg(points.map(p => delta.pointCost(p._1, p._2).bytes)),
        avg(points.map(p => delta.pointCost(p._1, p._2).queries))),
      CostRow("SubChunk",
        sub.storageBytes, mv * s + c * d * (n - 1) * mv * s,
        avg(versions.map(sub.versionCost(_).bytes)), avg(versions.map(sub.versionCost(_).queries)),
        mv * (s + c * d * (n - 1) * s), mv,
        avg(points.map(p => sub.pointCost(p._2).bytes)),
        avg(points.map(p => sub.pointCost(p._2).queries))),
      CostRow("Single-address space",
        single.storageBytes, mv * s + d * (n - 1) * mv * s,
        avg(versions.map(single.versionCost(_).bytes)), avg(versions.map(single.versionCost(_).queries)),
        mv * s, mv * s,
        avg(points.map(p => single.pointCost(p._1, p._2).bytes)),
        avg(points.map(p => single.pointCost(p._1, p._2).queries))),
    )
  }

  /** A chain where every change is a modification (no inserts/deletes) —
    * matches Table 1's simplifying assumptions exactly.
    */
  def chainPureUpdates(spec: DatasetSpec): VersionedDataset = {
    val tree = VersionTree.chain(spec.nVersions)
    val rnd = new Random(spec.seed)
    val deltas = new Array[Delta](spec.nVersions)
    val lineage = mutable.LongMap.empty[Long]
    deltas(0) = Delta(Array.tabulate(spec.rootRecords)(k => Ck.pack(k.toLong, 0)), Array.emptyLongArray)
    var cur = deltas(0).adds
    for (v <- 1 until spec.nVersions) {
      val nMod = math.max(1, math.round(spec.updateFrac * cur.length).toInt)
      val victims = rnd.shuffle(cur.toVector).take(nMod)
      val adds = victims.map(old => Ck.pack(Ck.key(old), v)).sorted.toArray
      victims.foreach(old => lineage(Ck.pack(Ck.key(old), v)) = old)
      deltas(v) = Delta(adds, victims.sorted.toArray)
      cur = deltas(v).applyTo(cur)
    }
    new VersionedDataset(spec, tree, deltas, lineage)
  }

  // -------------------------------------------------------------------------
  // Table 2 — dataset descriptions
  // -------------------------------------------------------------------------

  def datasetsTable(specs: Seq[DatasetSpec] = DatasetSpec.table2): Seq[DatasetStats] =
    specs.map(s => dataset(s).stats)

  // -------------------------------------------------------------------------
  // Fig 8 — total version span without compression (also a table here)
  // -------------------------------------------------------------------------

  final case class SpanRow(datasetName: String, algorithm: String, totalSpan: Long)

  def spanComparison(spark: SparkSession, specs: Seq[DatasetSpec],
                     capacity: Long = DefaultCapacity): Seq[SpanRow] =
    specs.flatMap { spec =>
      val ds = dataset(spec)
      val in = PartitionInput(ds.tree, ds.membersItems, ds.itemSizes)
      val algoRows = partitioners(spark).map { p =>
        SpanRow(spec.name, p.name, Span.total(in.members, p.partition(in, capacity)))
      }
      algoRows :+ SpanRow(spec.name, "Delta", new DeltaLayout(ds, capacity).totalVersionSpan)
    }

  // -------------------------------------------------------------------------
  // Fig 9 — β sweep for BOTTOM-UP
  // -------------------------------------------------------------------------

  final case class BetaRow(beta: Int, totalSpan: Long, wallSecs: Double)

  def betaSweep(spec: DatasetSpec, betas: Seq[Int],
                capacity: Long = DefaultCapacity): Seq[BetaRow] = {
    val ds = dataset(spec)
    val in = PartitionInput(ds.tree, ds.membersItems, ds.itemSizes)
    betas.map { b =>
      val p = new BottomUpPartitioner(b)
      val t0 = System.nanoTime()
      val a = p.partition(in, capacity)
      val secs = (System.nanoTime() - t0) / 1e9
      BetaRow(b, Span.total(in.members, a), secs)
    }
  }

  // -------------------------------------------------------------------------
  // Fig 10 — compression sweep (span + compression ratio vs sub-chunk size)
  // -------------------------------------------------------------------------

  final case class CompressionRow(datasetName: String, pdPct: Int, k: Int,
                                  algorithm: String, totalSpan: Long, ratio: Double)

  def compressionSweep(spark: SparkSession, base: DatasetSpec,
                       pds: Seq[Double] = Seq(0.10, 0.05, 0.01),
                       ks: Seq[Int] = Seq(1, 5, 10, 25, 50),
                       capacity: Long = DefaultCapacity): Seq[CompressionRow] =
    for {
      pd <- pds
      spec = base.withPd(pd)
      ds = dataset(spec)
      k <- ks
      sub = SubChunker.build(ds, k)
      p <- partitioners(spark).filterNot(_.name == "BreadthFirst")
    } yield {
      val a = p.partition(sub.input, capacity)
      CompressionRow(base.name, (pd * 100).toInt, k, p.name,
        Span.total(sub.scMembersOrig, a), sub.compressionRatio)
    }

  // -------------------------------------------------------------------------
  // Fig 11 — query processing performance (simulated seconds)
  // -------------------------------------------------------------------------

  final case class QueryPerfRow(datasetName: String, query: String, k: Int,
                                algorithm: String, secs: Double)

  def queryPerf(spark: SparkSession, spec: DatasetSpec,
                ks: Seq[Int] = Seq(1, 5, 10, 25, 50),
                capacity: Long = DefaultCapacity,
                nQ1: Int = 50, nQ3: Int = 100, seed: Long = 23L): Seq[QueryPerfRow] = {
    val ds = dataset(spec)
    val rnd = new Random(seed)
    val qVersions = Seq.fill(nQ1)(rnd.nextInt(ds.tree.size))
    val allKeys = ds.uniqueCks.map(Ck.key).distinct
    val qKeys = Seq.fill(nQ3)(allKeys(rnd.nextInt(allKeys.length)))
    val keySpanRange = math.max(1L, (allKeys.max - allKeys.min) / 10)
    val qRanges = qVersions.map { v =>
      val lo = allKeys.min + (rnd.nextDouble() * (allKeys.max - allKeys.min - keySpanRange)).toLong
      (v, lo, lo + keySpanRange)
    }
    val cost = CostModel()

    val rows = mutable.ArrayBuffer.empty[QueryPerfRow]
    for (k <- ks; p <- partitioners(spark).filterNot(_.name == "BreadthFirst")) {
      val sub = SubChunker.build(ds, k)
      val a = p.partition(sub.input, capacity)
      val qp = new QueryProcessor(ds, sub, a, new SimulatedKVS(1, cost))
      qp.populate()
      def timed(run: => RetrievalCost): Double = {
        val c = run
        cost.timeSecs(c.queries, c.bytes)
      }
      rows += QueryPerfRow(spec.name, "Q1", k, p.name,
        qVersions.map(v => timed(qp.fullVersion(v)._2)).sum)
      rows += QueryPerfRow(spec.name, "Q2", k, p.name,
        qRanges.map { case (v, lo, hi) => timed(qp.range(v, lo, hi)._2) }.sum)
      rows += QueryPerfRow(spec.name, "Q3", k, p.name,
        qKeys.map(key => timed(qp.evolution(key)._2)).sum)
    }
    // DELTA supports no record-level compression: reported at k=1 only
    val delta = new DeltaLayout(ds, capacity)
    rows += QueryPerfRow(spec.name, "Q1", 1, "Delta",
      qVersions.map(v => { val c = delta.versionCost(v); cost.timeSecs(c.queries, c.bytes) }).sum)
    // Q2 on DELTA reconstructs the full version then filters (§5.4)
    rows += QueryPerfRow(spec.name, "Q2", 1, "Delta",
      qRanges.map { case (v, _, _) => val c = delta.versionCost(v); cost.timeSecs(c.queries, c.bytes) }.sum)
    rows += QueryPerfRow(spec.name, "Q3", 1, "Delta",
      { val c = delta.evolutionCost; qKeys.length * cost.timeSecs(c.queries, c.bytes) / ds.tree.size })
    // SUBCHUNK baseline (caption numbers in Fig 11)
    val subL = new SubChunkLayout(ds)
    rows += QueryPerfRow(spec.name, "Q1", 0, "SubChunk",
      qVersions.map(v => { val c = subL.versionCost(v); cost.timeSecs(c.queries, c.bytes) }).sum)
    rows += QueryPerfRow(spec.name, "Q2", 0, "SubChunk",
      qRanges.map { case (v, lo, hi) =>
        val keys = ds.members(v).map(Ck.key).filter(key => key >= lo && key <= hi)
        cost.timeSecs(keys.length.toLong, keys.map(subL.keyBytes).sum)
      }.sum)
    rows += QueryPerfRow(spec.name, "Q3", 0, "SubChunk",
      qKeys.map(key => { val c = subL.evolutionCost(key); cost.timeSecs(c.queries, c.bytes) }).sum)
    rows.toSeq
  }

  // -------------------------------------------------------------------------
  // Fig 12 — weak scalability
  // -------------------------------------------------------------------------

  final case class ScalabilityRow(datasetName: String, nodes: Int,
                                  q1Secs: Double, avgVersionSpan: Double,
                                  q3Secs: Double, avgKeySpan: Double)

  def scalability(gOrH: Int => DatasetSpec, nodes: Seq[Int] = Seq(1, 2, 4, 8, 12, 16),
                  capacity: Long = DefaultCapacity,
                  nQueries: Int = 40, seed: Long = 31L): Seq[ScalabilityRow] =
    nodes.map { nn =>
      val spec = gOrH(nn)
      val ds = dataset(spec)
      val sub = SubChunker.build(ds, 1)
      val a = new BottomUpPartitioner().partition(sub.input, capacity)
      val kvs = new SimulatedKVS(nn, CostModel())
      val qp = new QueryProcessor(ds, sub, a, kvs)
      qp.populate()
      val rnd = new Random(seed)
      val qVersions = Seq.fill(nQueries)(rnd.nextInt(ds.tree.size))
      val allKeys = ds.uniqueCks.map(Ck.key).distinct
      val qKeys = Seq.fill(nQueries)(allKeys(rnd.nextInt(allKeys.length)))
      val q1 = qVersions.map { v =>
        val c = qp.fullVersion(v)._2; kvs.cost.timeSecs(c.queries, c.bytes)
      }
      val q3 = qKeys.map { key =>
        val c = qp.evolution(key)._2; kvs.cost.timeSecs(c.queries, c.bytes)
      }
      ScalabilityRow(spec.name, nn,
        q1.sum / nQueries, qVersions.map(qp.versionSpan(_).toDouble).sum / nQueries,
        q3.sum / nQueries, qKeys.map(qp.keySpan(_).toDouble).sum / nQueries)
    }

  // -------------------------------------------------------------------------
  // Fig 13 — online partitioning quality
  // -------------------------------------------------------------------------

  final case class OnlineRow(datasetName: String, batchSize: Int, versions: Int, ratio: Double)

  def onlineQuality(spec: DatasetSpec, batchSizes: Seq[Int], checkpoints: Seq[Int],
                    capacity: Long = DefaultCapacity): Seq[OnlineRow] = {
    val ds = dataset(spec)
    val offline = checkpoints.map { n =>
      val pre = ds.prefix(n)
      val in = PartitionInput(pre.tree, pre.membersItems, pre.itemSizes)
      n -> Span.total(in.members, new BottomUpPartitioner().partition(in, capacity))
    }.toMap
    for {
      b <- batchSizes
      n <- checkpoints
      if n >= b
    } yield {
      val online = new OnlinePartitioner(ds, capacity, b).run(n)
      OnlineRow(spec.name, b, n, online.totalSpan(n).toDouble / offline(n))
    }
  }
}
