package repro.core

import repro.data.RecordModel

/** Cost of answering one retrieval query: number of backend requests and
  * bytes transferred (§2.2's two retrieval-cost components).
  */
final case class RetrievalCost(queries: Long, bytes: Long) {
  def +(o: RetrievalCost): RetrievalCost = RetrievalCost(queries + o.queries, bytes + o.bytes)
}

/** The DELTA baseline (§2.2): each version is stored as the delta from its
  * parent (modified records delta-encoded, deletions as tombstones), the
  * root in full. Reconstruction replays the path from the root.
  */
final class DeltaLayout(ds: VersionedDataset, capacity: Long) {
  val deltaBytesPerVersion: Array[Long] = Array.tabulate(ds.tree.size)(ds.deltaBytes)

  /** Deltas are stored chunked at the same capacity as RStore's chunks so
    * span comparisons (Fig 8) are apples-to-apples.
    */
  val chunksPerVersion: Array[Long] =
    deltaBytesPerVersion.map(b => math.max(1L, (b + capacity - 1) / capacity))

  def storageBytes: Long = deltaBytesPerVersion.sum
  def numChunks: Long = chunksPerVersion.sum

  def versionSpan(v: Int): Long = ds.tree.pathFromRoot(v).map(chunksPerVersion).sum
  def totalVersionSpan: Long = (0 until ds.tree.size).map(versionSpan).sum

  def versionCost(v: Int): RetrievalCost =
    RetrievalCost(versionSpan(v), ds.tree.pathFromRoot(v).map(deltaBytesPerVersion).sum)

  /** Point query: fetch deltas from `v` upward until the delta that created
    * the record for `key` is found (its origin version).
    */
  def pointCost(v: Int, key: Long): RetrievalCost = {
    val origin = ds.originOf(v, key)
    val path = ds.tree.pathFromRoot(v).dropWhile(_ != origin)
    RetrievalCost(path.map(chunksPerVersion).sum, path.map(deltaBytesPerVersion).sum)
  }

  /** Record evolution requires reconstructing every version (§5.4 calls this
    * impractical for DELTA) — cost is the sum of all version costs.
    */
  def evolutionCost: RetrievalCost =
    (0 until ds.tree.size).map(versionCost).reduce(_ + _)
}

/** The SUBCHUNK baseline (§2.2): all records of a primary key stored as one
  * compressed object keyed by the primary key.
  */
final class SubChunkLayout(ds: VersionedDataset) {
  /** Compressed bytes of the per-key object: lineage-forest roots in full,
    * everything else delta-encoded.
    */
  def keyBytes(key: Long): Long = {
    val records = ds.recordsOfKey(key)
    records.map { ck =>
      if (ds.lineage(ck).isDefined) RecordModel.diffSize(ck, ds.spec)
      else RecordModel.size(ck, ds.spec)
    }.sum + 16L * records.length
  }

  lazy val allKeys: Array[Long] = {
    val out = Array.newBuilder[Long]
    var i = 0
    while (i < ds.uniqueCks.length) {
      val k = Ck.key(ds.uniqueCks(i))
      if (i == 0 || Ck.key(ds.uniqueCks(i - 1)) != k) out += k
      i += 1
    }
    out.result()
  }

  def storageBytes: Long = allKeys.map(keyBytes).sum
  def numObjects: Long = allKeys.length.toLong

  /** Version retrieval touches one object per key in the version. */
  def versionCost(v: Int): RetrievalCost = {
    val keys = ds.members(v).map(Ck.key)
    RetrievalCost(keys.length.toLong, keys.map(keyBytes).sum)
  }

  def pointCost(key: Long): RetrievalCost = RetrievalCost(1, keyBytes(key))
  def evolutionCost(key: Long): RetrievalCost = RetrievalCost(1, keyBytes(key))
}

/** The SINGLE-ADDRESS-SPACE baseline (§2.2): every record stored under its
  * composite key; no compression, one request per record.
  */
final class SingleAddressLayout(ds: VersionedDataset) {
  def storageBytes: Long = ds.itemSizes.sum
  def numObjects: Long = ds.uniqueCks.length.toLong

  def versionCost(v: Int): RetrievalCost =
    RetrievalCost(ds.members(v).length.toLong,
      ds.members(v).map(RecordModel.size(_, ds.spec)).sum)

  def pointCost(v: Int, key: Long): RetrievalCost = {
    val ck = Ck.pack(key, ds.originOf(v, key))
    RetrievalCost(1, RecordModel.size(ck, ds.spec))
  }

  def evolutionCost(key: Long): RetrievalCost = {
    val records = ds.recordsOfKey(key)
    RetrievalCost(records.length.toLong, records.map(RecordModel.size(_, ds.spec)).sum)
  }
}

/** Table 1's first row: every version chunked *independently* (duplicated
  * across versions, no dedup). Best possible span per version, worst
  * storage.
  */
final class IndependentChunkedLayout(ds: VersionedDataset, capacity: Long) {
  def versionBytes(v: Int): Long = ds.members(v).map(RecordModel.size(_, ds.spec)).sum
  def storageBytes: Long = (0 until ds.tree.size).map(versionBytes).sum
  def versionCost(v: Int): RetrievalCost = {
    val b = versionBytes(v)
    RetrievalCost(math.max(1L, (b + capacity - 1) / capacity), b)
  }
  def pointCost: RetrievalCost = RetrievalCost(1, capacity) // one chunk holds it
}
