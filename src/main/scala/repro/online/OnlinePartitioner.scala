package repro.online

import repro.core._

import scala.collection.mutable

/** Online partitioning (§4).
  *
  * New versions are not placed immediately: their deltas accumulate in a
  * *delta store* and, once `batchSize` versions are buffered, a background
  * pass runs the (adapted) BOTTOM-UP algorithm over just that batch. Only
  * records that *originated* inside the batch are placed — previously
  * partitioned records are never moved (the paper explicitly forgoes
  * repartitioning), and every batch opens fresh chunks.
  *
  * The adapted algorithm runs on the subtree induced by the batch versions:
  * batch versions keep their nearest in-batch ancestor as parent; subtrees
  * whose parent predates the batch hang off a synthetic empty root, and
  * each version's membership is restricted to batch-originated records —
  * so BOTTOM-UP orders the new records by how long they survive *within
  * the batch*, which is all the information available online.
  */
final class OnlinePartitioner(ds: VersionedDataset, capacity: Long, batchSize: Int) {
  require(batchSize >= 1)

  /** State after ingesting a number of versions. */
  final case class State(ckChunk: mutable.LongMap[Int], numChunks: Int) {
    /** Per-version span over the first `n` versions. */
    def totalSpan(n: Int): Long = {
      var total = 0L
      val seen = mutable.HashSet.empty[Int]
      var v = 0
      while (v < n) {
        seen.clear()
        ds.members(v).foreach(ck => seen += ckChunk(ck))
        total += seen.size
        v += 1
      }
      total
    }
  }

  /** Ingest versions `0 until upTo` in batches and return the placement. */
  def run(upTo: Int): State = {
    require(upTo >= 1 && upTo <= ds.tree.size)
    val ckChunk = mutable.LongMap.empty[Int]
    var chunkBase = 0
    var b0 = 0
    while (b0 < upTo) {
      val b1 = math.min(b0 + batchSize, upTo)
      val a = partitionBatch(b0, b1)
      a._1.foreachEntry((ck, local) => ckChunk(ck) = chunkBase + local)
      chunkBase += a._2
      b0 = b1
    }
    State(ckChunk, chunkBase)
  }

  /** Partition the records originating in versions `[b0, b1)`; returns
    * ck→local-chunk and the local chunk count.
    */
  private def partitionBatch(b0: Int, b1: Int): (mutable.LongMap[Int], Int) = {
    val batchLen = b1 - b0
    // new records of the batch, with dense local item ids
    val newCks: Array[Long] = {
      val out = Array.newBuilder[Long]
      var v = b0
      while (v < b1) { out ++= ds.deltas(v).adds; v += 1 }
      val arr = out.result()
      java.util.Arrays.sort(arr)
      arr
    }
    def localItem(ck: Long): Int = java.util.Arrays.binarySearch(newCks, ck)

    // induced tree: local id 0 is a synthetic empty root; batch version v
    // maps to local id v-b0+1, parented to its nearest in-batch ancestor
    val parent = new Array[Int](batchLen + 1)
    parent(0) = -1
    var v = b0
    while (v < b1) {
      val p = ds.tree.parent(v)
      parent(v - b0 + 1) = if (p >= b0) p - b0 + 1 else 0
      v += 1
    }
    val members = new Array[Array[Int]](batchLen + 1)
    members(0) = Array.emptyIntArray
    v = b0
    while (v < b1) {
      // batch-originated records still live in v (sorted: ck order = id order)
      members(v - b0 + 1) = ds.members(v)
        .filter(ck => Ck.version(ck) >= b0)
        .map(localItem)
      v += 1
    }
    val sizes = newCks.map(ck => repro.data.RecordModel.size(ck, ds.spec))
    val in = PartitionInput(new VersionTree(parent), members, sizes)
    val a = new BottomUpPartitioner().partition(in, capacity)
    val out = mutable.LongMap.empty[Int]
    newCks.indices.foreach(i => out(newCks(i)) = a.itemChunk(i))
    (out, a.numChunks)
  }
}
