package repro.core

import scala.collection.mutable

/** Input to the partitioning algorithms (§2.5).
  *
  * Items are dense ids `0 until numItems`; they are raw records when k=1 or
  * sub-chunks when record-level compression is enabled (§3.4). In both cases
  * the algorithms only need the version tree, per-version item membership,
  * and per-item sizes.
  *
  * @param members per version: member item ids, sorted ascending
  */
final case class PartitionInput(
    tree: VersionTree,
    members: Array[Array[Int]],
    itemSizes: Array[Long],
) {
  require(members.length == tree.size)
  def numItems: Int = itemSizes.length

  /** Items present in `v` but not its parent (the delta's additions);
    * for the root, all of its members.
    */
  def adds(v: Int): Array[Int] =
    if (v == 0) members(0)
    else {
      val p = members(tree.parent(v)); val c = members(v)
      val out = Array.newBuilder[Int]
      var i = 0; var j = 0
      while (j < c.length) {
        if (i < p.length && p(i) == c(j)) { i += 1; j += 1 }
        else if (i < p.length && p(i) < c(j)) i += 1
        else { out += c(j); j += 1 }
      }
      out.result()
    }
}

/** An item→chunk assignment produced by a partitioner. */
final case class Assignment(itemChunk: Array[Int], numChunks: Int) {
  require(itemChunk.forall(c => c >= 0 && c < numChunks), "dangling chunk id")

  def chunkBytes(itemSizes: Array[Long]): Array[Long] = {
    val b = new Array[Long](numChunks)
    var i = 0
    while (i < itemChunk.length) { b(itemChunk(i)) += itemSizes(i); i += 1 }
    b
  }
}

/** Fixed-capacity sequential chunk filler (§2.5's fixed-chunk-size rule):
  * items are appended to the open chunk while it is below `capacity`; the
  * first item that lands on a chunk already at/over capacity opens a new
  * one. Since item sizes ≪ capacity this keeps every chunk within the
  * paper's 25 % slack.
  */
final class ChunkBuilder(capacity: Long, numItems: Int) {
  val itemChunk: Array[Int] = Array.fill(numItems)(-1)
  private val bytes = mutable.ArrayBuffer.empty[Long]
  private var cur = -1

  private def open(): Unit = { bytes += 0L; cur = bytes.length - 1 }

  def add(item: Int, size: Long): Unit = {
    require(itemChunk(item) == -1, s"item $item assigned twice")
    if (cur == -1 || bytes(cur) >= capacity) open()
    itemChunk(item) = cur
    bytes(cur) += size
  }

  /** Close the open chunk so the next `add` starts a fresh one; returns the
    * (chunkId, bytes) of the closed chunk if it was non-empty and below
    * capacity — the "partial chunk" the BOTTOM-UP algorithm merges later.
    */
  def sealPartial(): Option[(Int, Long)] = {
    val out = if (cur >= 0 && bytes(cur) > 0 && bytes(cur) < capacity) Some((cur, bytes(cur))) else None
    cur = -1
    out
  }

  def numChunks: Int = bytes.length
  def chunkBytesSoFar: IndexedSeq[Long] = bytes.toIndexedSeq

  /** Bytes in the currently open chunk (0 if none). */
  def openBytes: Long = if (cur == -1) 0L else bytes(cur)

  def result(): Assignment = {
    require(itemChunk.forall(_ >= 0), "unassigned items remain")
    Assignment(itemChunk, bytes.length)
  }

  /** Merge the given partial chunks by relabeling their chunk ids, then
    * compact ids — the fragmentation cleanup at the end of §3.2.
    *
    * Partials are merged in *creation order*: the caller produces them
    * during a post-order traversal, so consecutive partials hold records of
    * tree-adjacent versions and merging neighbours preserves locality. A
    * size-ordered bin packing (e.g. first-fit decreasing) would mix records
    * of unrelated versions into one chunk and inflate every span that
    * touches it.
    */
  def mergePartialsAndResult(partials: Seq[(Int, Long)]): Assignment = {
    val limit = capacity + capacity / 4
    val groups = mutable.ArrayBuffer.empty[(mutable.ArrayBuffer[Int], Long)] // (chunk ids, bytes)
    for ((cid, sz) <- partials) {
      if (groups.nonEmpty && groups.last._2 + sz <= limit) {
        val (ids, b) = groups.last
        ids += cid
        groups(groups.length - 1) = (ids, b + sz)
      } else groups += ((mutable.ArrayBuffer(cid), sz))
    }
    val remap = new Array[Int](bytes.length)
    java.util.Arrays.fill(remap, -1)
    for ((ids, _) <- groups; id <- ids) remap(id) = ids.head
    // compact chunk ids
    var next = 0
    val compact = new Array[Int](bytes.length)
    java.util.Arrays.fill(compact, -1)
    def target(c: Int): Int = if (remap(c) == -1) c else remap(c)
    for (c <- bytes.indices) {
      val t = target(c)
      if (compact(t) == -1) { compact(t) = next; next += 1 }
    }
    require(itemChunk.forall(_ >= 0), "unassigned items remain")
    Assignment(itemChunk.map(c => compact(target(c))), next)
  }
}

/** A partitioning algorithm: assigns every item to a chunk of ≈`capacity`
  * bytes, minimizing version spans (§2.5's optimization problem).
  */
trait Partitioner {
  def name: String
  def partition(in: PartitionInput, capacity: Long): Assignment
}

/** Span computation — the paper's retrieval-cost metric: the number of
  * distinct chunks holding at least one member item of a version.
  */
object Span {
  def perVersion(members: Array[Array[Int]], a: Assignment): Array[Int] = {
    val stamp = Array.fill(a.numChunks)(-1)
    members.zipWithIndex.map { case (items, v) =>
      var span = 0
      var i = 0
      while (i < items.length) {
        val c = a.itemChunk(items(i))
        if (stamp(c) != v) { stamp(c) = v; span += 1 }
        i += 1
      }
      span
    }
  }

  def total(members: Array[Array[Int]], a: Assignment): Long =
    perVersion(members, a).map(_.toLong).sum
}
