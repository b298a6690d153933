package repro.query

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Assignment, Ck, SubChunking, VersionedDataset}

/** DataFrame reference implementations of the retrieval queries and layout
  * metrics. These run through Catalyst (joins + aggregations over the
  * membership/assignment relations) and are what the DuckDB oracle checks
  * against in tests — an incorrect partitioner index or extraction path
  * shows up as a result mismatch, not just a slow query.
  */
object SparkQueries {

  /** `(key, origin, chunk)` — the record→chunk placement relation. */
  def assignmentDF(spark: SparkSession, ds: VersionedDataset, sc: SubChunking,
                   a: Assignment): DataFrame = {
    import spark.implicits._
    ds.uniqueCks.indices.map { i =>
      val ck = ds.uniqueCks(i)
      (Ck.key(ck), Ck.version(ck), a.itemChunk(sc.recordSc(i)))
    }.toDF("key", "origin", "chunk")
  }

  /** Per-version span: distinct chunks holding ≥1 record of the version. */
  def spansDF(membership: DataFrame, assignment: DataFrame): DataFrame =
    membership
      .join(assignment, Seq("key", "origin"))
      .groupBy(col("version"))
      .agg(countDistinct(col("chunk")).as("span"))

  /** Q1 as a DataFrame: records of version `v`. */
  def fullVersionDF(membership: DataFrame, v: Int): DataFrame =
    membership.where(col("version") === v).select(col("key"), col("origin"))

  /** Q2 as a DataFrame: records of `v` with key in `[lo, hi]`. */
  def rangeDF(membership: DataFrame, v: Int, lo: Long, hi: Long): DataFrame =
    membership
      .where(col("version") === v && col("key") >= lo && col("key") <= hi)
      .select(col("key"), col("origin"))

  /** Q3 as a DataFrame: the distinct records ever stored for `key`. */
  def evolutionDF(membership: DataFrame, key: Long): DataFrame =
    membership.where(col("key") === key).select(col("key"), col("origin")).distinct()

  /** Total version span (the Fig 8 metric) as a single-row DataFrame. */
  def totalSpanDF(membership: DataFrame, assignment: DataFrame): DataFrame =
    spansDF(membership, assignment).agg(sum(col("span")).as("total_span"))
}
