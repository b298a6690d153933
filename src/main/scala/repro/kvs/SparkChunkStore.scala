package repro.kvs

import org.apache.spark.sql.{DataFrame, SaveMode, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Assignment, Ck, SubChunking, VersionedDataset}

/** Physical chunk storage through Spark: the chunked layout is persisted as
  * Parquet partitioned by `chunk_id`, so retrieving a set of chunks is a
  * pruned columnar read — the DataFrame-native analogue of fetching chunk
  * blobs from the KVS. Used by correctness tests to exercise a real
  * write→read→extract path with materialized JSON payloads.
  */
final class SparkChunkStore(spark: SparkSession, path: String) {
  import spark.implicits._

  /** Write every record (with payload) into its chunk partition. */
  def write(ds: VersionedDataset, sc: SubChunking, a: Assignment): Unit = {
    val rows = ds.uniqueCks.indices.map { i =>
      val ck = ds.uniqueCks(i)
      (a.itemChunk(sc.recordSc(i)), Ck.key(ck), Ck.version(ck), ds.payload(ck))
    }
    rows.toDF("chunk_id", "key", "origin", "payload")
      .repartition(1)
      .write.mode(SaveMode.Overwrite)
      .partitionBy("chunk_id")
      .parquet(path)
  }

  /** Pruned read of the given chunks. */
  def readChunks(chunks: Seq[Int]): DataFrame =
    spark.read.parquet(path).where($"chunk_id".isin(chunks: _*))

  /** Q1 through the physical store: fetch the version's chunks, then use the
    * chunk-map information (version → composite keys, carried by each chunk)
    * to extract exactly the version's records.
    */
  def fullVersion(ds: VersionedDataset, chunks: Seq[Int], v: Int): DataFrame = {
    val memberCks = ds.members(v).map(ck => (Ck.key(ck), Ck.version(ck))).toSeq
    val mem = memberCks.toDF("key", "origin")
    readChunks(chunks).join(mem, Seq("key", "origin"), "left_semi")
      .select($"key", $"origin", $"payload")
  }

  /** Q3 through the physical store: all records of `key` in the fetched chunks. */
  def evolution(chunks: Seq[Int], key: Long): DataFrame =
    readChunks(chunks).where($"key" === key).select($"key", $"origin", $"payload")
}
