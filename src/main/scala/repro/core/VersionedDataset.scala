package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.data.{DatasetSpec, RecordModel}

import scala.collection.mutable

/** Summary statistics of a dataset — the columns of Table 2. */
final case class DatasetStats(
    name: String,
    nVersions: Int,
    avgDepth: Double,
    avgRecordsPerVersion: Double,
    updatePct: Double,
    updateType: String,
    uniqueRecords: Long,
    uniqueBytes: Long,
    totalBytes: Long,
)

/** A fully materialized multi-versioned dataset.
  *
  * Holds the version tree, the per-edge deltas (`deltas(v)` derives `V_v`
  * from its parent; `deltas(0).adds` is the root's content), the lineage of
  * modified records (composite key → the composite key it modified), and the
  * materialized per-version membership (sorted packed composite keys).
  *
  * Dense *item ids* (`0 until uniqueCks.length`, in sorted-ck order) are the
  * unit the partitioning algorithms operate on when no sub-chunking is used.
  */
final class VersionedDataset(
    val spec: DatasetSpec,
    val tree: VersionTree,
    val deltas: Array[Delta],
    val lineageMap: collection.Map[Long, Long],
) {
  require(deltas.length == tree.size)

  /** Per-version membership: sorted packed composite keys. */
  val members: Array[Array[Long]] = {
    val m = new Array[Array[Long]](tree.size)
    m(0) = deltas(0).adds
    var v = 1
    while (v < tree.size) { m(v) = deltas(v).applyTo(m(tree.parent(v))); v += 1 }
    m
  }

  /** All distinct records, sorted. Every add creates a fresh composite key,
    * so this is exactly the concatenation of all deltas' adds.
    */
  val uniqueCks: Array[Long] = {
    val out = deltas.iterator.flatMap(_.adds).toArray
    java.util.Arrays.sort(out)
    out
  }

  /** Dense item id of a composite key (position in `uniqueCks`). */
  def itemOf(ck: Long): Int = {
    val i = java.util.Arrays.binarySearch(uniqueCks, ck)
    require(i >= 0, s"unknown record ${Ck.show(ck)}")
    i
  }

  lazy val itemSizes: Array[Long] = uniqueCks.map(RecordModel.size(_, spec))

  /** Per-version membership as dense item ids (sorted — ck order is id order). */
  lazy val membersItems: Array[Array[Int]] = members.map(_.map(itemOf))

  /** Lineage parent of a modified record, if any. */
  def lineage(ck: Long): Option[Long] = lineageMap.get(ck)

  /** All records (across versions) for a primary key, in ck order — the
    * ground truth for record-evolution queries (Q3). Exploits that packed
    * cks sort primarily by key.
    */
  def recordsOfKey(key: Long): Array[Long] = {
    val lo = Ck.pack(key, 0)
    var i = java.util.Arrays.binarySearch(uniqueCks, lo)
    if (i < 0) i = -i - 1
    val out = Array.newBuilder[Long]
    while (i < uniqueCks.length && Ck.key(uniqueCks(i)) == key) { out += uniqueCks(i); i += 1 }
    out.result()
  }

  /** Origin version of the record for `key` live in version `v` — the
    * version-to-record lookup of Example 2. Requires the key to be live.
    */
  def originOf(v: Int, key: Long): Int = {
    val m = members(v)
    var i = java.util.Arrays.binarySearch(m, Ck.pack(key, 0))
    if (i < 0) i = -i - 1
    require(i < m.length && Ck.key(m(i)) == key, s"key $key not live in version $v")
    Ck.version(m(i))
  }

  /** Whether `key` is live in version `v`. */
  def isLive(v: Int, key: Long): Boolean = {
    val m = members(v)
    var i = java.util.Arrays.binarySearch(m, Ck.pack(key, 0))
    if (i < 0) i = -i - 1
    i < m.length && Ck.key(m(i)) == key
  }

  /** Number of versions each item belongs to (the item's "version count"). */
  lazy val itemVersionCounts: Array[Int] = {
    val c = new Array[Int](uniqueCks.length)
    membersItems.foreach(_.foreach(i => c(i) += 1))
    c
  }

  /** Total bytes if every version were stored independently (Table 2's
    * "Total size"); unique bytes = deduplicated storage.
    */
  lazy val stats: DatasetStats = {
    val uniqueBytes = itemSizes.sum
    var total = 0L
    var i = 0
    while (i < uniqueCks.length) { total += itemSizes(i) * itemVersionCounts(i); i += 1 }
    DatasetStats(
      name = spec.name,
      nVersions = tree.size,
      avgDepth = tree.avgLeafDepth,
      avgRecordsPerVersion = members.iterator.map(_.length.toLong).sum.toDouble / tree.size,
      updatePct = spec.updateFrac * 100,
      updateType = spec.updateType,
      uniqueRecords = uniqueCks.length.toLong,
      uniqueBytes = uniqueBytes,
      totalBytes = total,
    )
  }

  /** Size in bytes of the delta deriving `v` from its parent, with modified
    * records delta-encoded against their lineage parents (the DELTA
    * baseline's storage unit). The root's "delta" is its full content.
    */
  def deltaBytes(v: Int): Long = {
    val d = deltas(v)
    var bytes = 0L
    d.adds.foreach { ck =>
      bytes += (if (lineageMap.contains(ck)) RecordModel.diffSize(ck, spec)
                else RecordModel.size(ck, spec))
    }
    bytes + d.dels.length.toLong * RecordModel.TombstoneSize
  }

  /** JSON payload of a record (correctness tests). */
  def payload(ck: Long): String = RecordModel.payload(ck, spec, lineageMap.get)

  /** The dataset restricted to its first `n` versions (version ids are
    * generated in commit order, so this is a valid history prefix). Used to
    * compare online partitioning against an offline run "for the same
    * number of versions" (§5.6).
    */
  def prefix(n: Int): VersionedDataset = {
    require(n >= 1 && n <= tree.size)
    if (n == tree.size) this
    else new VersionedDataset(spec.copy(name = s"${spec.name}[0,$n)"),
      new VersionTree(tree.parent.take(n)), deltas.take(n), lineageMap)
  }

  // ---- DataFrame exports -----------------------------------------------------

  /** `(version, key, origin)` — one row per record-in-version. */
  def membershipDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    val rows = for {
      v <- members.indices.iterator
      ck <- members(v).iterator
    } yield (v, Ck.key(ck), Ck.version(ck))
    rows.toSeq.toDF("version", "key", "origin")
  }

  /** `(key, origin, size)` — one row per distinct record. */
  def recordsDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    uniqueCks.iterator
      .map(ck => (Ck.key(ck), Ck.version(ck), RecordModel.size(ck, spec)))
      .toSeq
      .toDF("key", "origin", "size")
  }

  /** `(key, origin, payload)` — with materialized JSON; small datasets only. */
  def payloadsDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    uniqueCks.iterator
      .map(ck => (Ck.key(ck), Ck.version(ck), payload(ck)))
      .toSeq
      .toDF("key", "origin", "payload")
  }
}

/** Conversion of a version DAG (merges) into a dataset over a version tree,
  * per Fig 4: each merge keeps one parent edge; records that arrived
  * exclusively through dropped edges are renamed to look like fresh inserts
  * in the merge version. Queries keep using the original membership — only
  * partitioning sees the transformed dataset.
  */
object DagToTree {
  def convert(dag: VersionDag, dagMembers: Array[Array[Long]], spec: DatasetSpec): VersionedDataset = {
    val (tree, _) = dag.toTree
    // ancestors along the *tree*, for checking whether a record's origin is
    // reachable without the dropped edges
    val anc: Array[Set[Int]] = {
      val a = new Array[Set[Int]](tree.size)
      a(0) = Set(0)
      for (v <- 1 until tree.size) a(v) = a(tree.parent(v)) + v
      a
    }
    def contains(v: Int, ck: Long): Boolean =
      java.util.Arrays.binarySearch(dagMembers(v), ck) >= 0
    // A record whose origin is not a tree-ancestor of v arrived through a
    // dropped edge; rename it to originate at the merge version where it
    // entered the kept path (the highest ancestor that has the record but
    // not its origin). Deterministic, so descendants agree on the new key.
    def renamed(v: Int, ck: Long): Long = {
      var m = v
      while (tree.parent(m) != -1 &&
             contains(tree.parent(m), ck) &&
             !anc(tree.parent(m)).contains(Ck.version(ck))) m = tree.parent(m)
      Ck.pack(Ck.key(ck), m)
    }
    val treeMembers = new Array[Array[Long]](tree.size)
    for (v <- 0 until tree.size) {
      treeMembers(v) = dagMembers(v).map { ck =>
        if (anc(v).contains(Ck.version(ck))) ck else renamed(v, ck)
      }.sorted
    }
    val deltas = new Array[Delta](tree.size)
    deltas(0) = Delta(treeMembers(0), Array.emptyLongArray)
    for (v <- 1 until tree.size)
      deltas(v) = Delta.between(treeMembers(tree.parent(v)), treeMembers(v))
    new VersionedDataset(spec, tree, deltas, Map.empty)
  }
}
