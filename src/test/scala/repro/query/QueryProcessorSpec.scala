package repro.query

import repro.SparkSpec
import repro.core._
import repro.data.{DatasetSpec, VersionedDataGen}
import repro.index.ChunkIndexes
import repro.kvs.SimulatedKVS

import scala.util.Random

class QueryProcessorSpec extends SparkSpec {
  private val capacity = 2048L
  private lazy val ds = VersionedDataGen.generate(
    DatasetSpec.tiny("qp", 25, 100, skewed = false, 3, seed = 81))

  private lazy val algos: Seq[Partitioner] =
    Seq(new BottomUpPartitioner(), TraversalPartitioner.dfs, new ShinglePartitioner(spark))

  private def processor(p: Partitioner, k: Int): QueryProcessor = {
    val sub = SubChunker.build(ds, k)
    val a = p.partition(sub.input, capacity)
    val qp = new QueryProcessor(ds, sub, a, new SimulatedKVS(2))
    qp.populate()
    qp
  }

  for (algoIdx <- 0 until 3; k <- Seq(1, 3)) {
    test(s"algo #$algoIdx k=$k: Q1 returns the exact version membership") {
      val qp = processor(algos(algoIdx), k)
      (0 until ds.tree.size).foreach { v =>
        val (records, cost) = qp.fullVersion(v)
        assert(records.toSeq == ds.members(v).toSeq)
        assert(cost.queries == qp.versionSpan(v))
        assert(cost.bytes > 0)
      }
    }

    test(s"algo #$algoIdx k=$k: Q2 returns exactly the in-range records") {
      val qp = processor(algos(algoIdx), k)
      val rnd = new Random(5)
      (0 until 10).foreach { _ =>
        val v = rnd.nextInt(ds.tree.size)
        val keys = ds.members(v).map(Ck.key)
        val lo = keys(rnd.nextInt(keys.length))
        val hi = lo + 20
        val (records, cost) = qp.range(v, lo, hi)
        val expect = ds.members(v).filter(ck => Ck.key(ck) >= lo && Ck.key(ck) <= hi)
        assert(records.toSeq == expect.toSeq)
        assert(cost.queries <= qp.versionSpan(v), "index-ANDing can only shrink the fetch set")
      }
    }

    test(s"algo #$algoIdx k=$k: Q3 returns every record of the key") {
      val qp = processor(algos(algoIdx), k)
      val rnd = new Random(6)
      (0 until 20).foreach { _ =>
        val ck = ds.uniqueCks(rnd.nextInt(ds.uniqueCks.length))
        val key = Ck.key(ck)
        val (records, cost) = qp.evolution(key)
        assert(records.toSeq == ds.recordsOfKey(key).toSeq)
        assert(cost.queries == qp.keySpan(key))
      }
    }

    test(s"algo #$algoIdx k=$k: point query finds the right record") {
      val qp = processor(algos(algoIdx), k)
      val rnd = new Random(7)
      (0 until 20).foreach { _ =>
        val v = rnd.nextInt(ds.tree.size)
        val ck = ds.members(v)(rnd.nextInt(ds.members(v).length))
        val (res, cost) = qp.point(v, Ck.key(ck))
        assert(res.contains(ck))
        assert(cost.queries >= 1)
        assert(cost.queries <= qp.versionSpan(v))
      }
    }

    test(s"algo #$algoIdx k=$k: point query on a dead key fetches nothing") {
      val qp = processor(algos(algoIdx), k)
      // find a key deleted by some version
      val dead = (1 until ds.tree.size).flatMap { v =>
        ds.deltas(v).dels.map(Ck.key).find(k => !ds.isLive(v, k)).map((v, _))
      }.headOption
      assume(dead.isDefined)
      val (res, cost) = qp.point(dead.get._1, dead.get._2)
      assert(res.isEmpty && cost.queries == 0)
    }
  }

  test("indexes: version projection matches per-version chunk sets") {
    val sub = SubChunker.build(ds, 1)
    val a = new BottomUpPartitioner().partition(sub.input, capacity)
    val idx = ChunkIndexes.build(ds, sub, a)
    (0 until ds.tree.size).foreach { v =>
      val expect = ds.membersItems(v).map(i => a.itemChunk(sub.recordSc(i))).distinct.sorted
      assert(idx.versionToChunks(v).toSeq == expect.toSeq)
    }
  }

  test("indexes: key projection covers every record's chunk") {
    val sub = SubChunker.build(ds, 2)
    val a = new BottomUpPartitioner().partition(sub.input, capacity)
    val idx = ChunkIndexes.build(ds, sub, a)
    ds.uniqueCks.indices.foreach { i =>
      val key = Ck.key(ds.uniqueCks(i))
      val chunk = a.itemChunk(sub.recordSc(i))
      assert(idx.keyToChunks(key).contains(chunk))
    }
  }

  test("indexes are small relative to the data (§2.4)") {
    val sub = SubChunker.build(ds, 1)
    val a = new BottomUpPartitioner().partition(sub.input, capacity)
    val idx = ChunkIndexes.build(ds, sub, a)
    val dataBytes = ds.itemSizes.sum
    assert(idx.versionIndexBytes < dataBytes / 10)
    assert(idx.keyIndexBytes < dataBytes)
  }

  test("chunk bytes in the index equal the assignment's chunk bytes") {
    val sub = SubChunker.build(ds, 1)
    val a = new BottomUpPartitioner().partition(sub.input, capacity)
    val idx = ChunkIndexes.build(ds, sub, a)
    assert(idx.chunkBytes.toSeq == a.chunkBytes(sub.scSizes).toSeq)
  }
}
