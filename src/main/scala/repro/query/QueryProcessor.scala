package repro.query

import repro.core.{Assignment, Ck, RetrievalCost, SubChunking, VersionedDataset}
import repro.index.ChunkIndexes
import repro.kvs.{Blob, KeyValueStore}

/** Query processing over a chunked layout (§2.4 "Indexes and Query
  * Processing Module").
  *
  * Chunks live in the backend KVS under their chunk ids; the in-memory
  * lossy projections pick the chunks to fetch, and the per-chunk maps
  * (reconstructed here from the dataset — in aggregate they carry exactly
  * the membership matrix) extract the requested records. Every query
  * returns both its answer (composite keys) and its backend cost.
  */
final class QueryProcessor(
    val ds: VersionedDataset,
    val sc: SubChunking,
    val assignment: Assignment,
    val kvs: KeyValueStore,
) {
  val indexes: ChunkIndexes = ChunkIndexes.build(ds, sc, assignment)

  /** Load every chunk into the KVS (done once at layout time). */
  def populate(): Unit =
    indexes.chunkBytes.zipWithIndex.foreach { case (b, c) => kvs.put(c.toLong, Blob(b)) }

  private def fetch(chunks: Seq[Int]): RetrievalCost = {
    val before = (kvs.tally.requests, kvs.tally.bytes)
    kvs.multiGet(chunks.map(_.toLong))
    RetrievalCost(kvs.tally.requests - before._1, kvs.tally.bytes - before._2)
  }

  /** Q1 — full version retrieval. */
  def fullVersion(v: Int): (Array[Long], RetrievalCost) = {
    val cost = fetch(indexes.versionToChunks(v).toSeq)
    (ds.members(v), cost)
  }

  /** Q2 — range retrieval: records of `v` with key in `[loKey, hiKey]`.
    * Index-ANDs the two projections (§2.4); lossiness can fetch chunks
    * that turn out to hold no qualifying record.
    */
  def range(v: Int, loKey: Long, hiKey: Long): (Array[Long], RetrievalCost) = {
    val vChunks = indexes.versionToChunks(v)
    val kChunks = scala.collection.mutable.SortedSet.empty[Int]
    var key = loKey
    while (key <= hiKey) { // keys are dense in our generator
      indexes.keyToChunks.get(key).foreach(_.foreach(kChunks += _))
      key += 1
    }
    val hit = vChunks.filter(kChunks.contains)
    val cost = fetch(hit.toSeq)
    val result = ds.members(v).filter(ck => { val k = Ck.key(ck); k >= loKey && k <= hiKey })
    (result, cost)
  }

  /** Q3 — record evolution: all records ever stored for `key`. */
  def evolution(key: Long): (Array[Long], RetrievalCost) = {
    val chunks = indexes.keyToChunks.getOrElse(key, Array.emptyIntArray)
    val cost = fetch(chunks.toSeq)
    (ds.recordsOfKey(key), cost)
  }

  /** Point query — the record for `key` in version `v`. */
  def point(v: Int, key: Long): (Option[Long], RetrievalCost) = {
    if (!ds.isLive(v, key)) return (None, RetrievalCost(0, 0))
    val vChunks = indexes.versionToChunks(v)
    val kChunks = indexes.keyToChunks.getOrElse(key, Array.emptyIntArray)
    val hit = vChunks.filter(c => java.util.Arrays.binarySearch(kChunks, c) >= 0)
    val cost = fetch(hit.toSeq)
    (Some(Ck.pack(key, ds.originOf(v, key))), cost)
  }

  /** Span of a version under this layout (chunks to fetch for Q1). */
  def versionSpan(v: Int): Int = indexes.versionToChunks(v).length

  /** Span of a key (chunks to fetch for Q3). */
  def keySpan(key: Long): Int =
    indexes.keyToChunks.getOrElse(key, Array.emptyIntArray).length
}
