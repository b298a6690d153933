package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Shingle (min-hash) based partitioning (§3.1, Algorithms 1–2).
  *
  * For each item, the set of versions it belongs to is summarized by `l`
  * min-hashes; sorting items lexicographically by their shingle vectors
  * places items with similar version sets next to each other, and the
  * sorted order is fed to the sequential chunk filler.
  *
  * The shingle computation and sort are expressed as a Spark DataFrame job
  * (groupBy + min-aggregates + orderBy) over the (item, version) membership
  * relation — this is the one partitioner that is embarrassingly parallel
  * and needs no version-tree structure. A driver-side reference
  * implementation (same hash family) backs the unit tests.
  */
final class ShinglePartitioner(spark: SparkSession, numShingles: Int = 4, seed: Long = 0x5417L)
    extends Partitioner {
  override val name: String = "Shingle"

  /** min-hash h_i over a version set, shared by driver and executors. */
  private def minHash(versions: Iterable[Int], i: Int): Long =
    versions.iterator.map(v => Hash64(v.toLong, seed + i)).min

  /** Items in shingle sort-order, computed with Spark. */
  def sparkOrder(in: PartitionInput): Array[Int] = {
    import spark.implicits._
    val rows: Seq[(Int, Int)] = (for {
      v <- in.members.indices.iterator
      item <- in.members(v).iterator
    } yield (item, v)).toSeq
    val df: DataFrame = rows.toDF("item", "version")
    val s = seed // local copy: the udf closure must not capture `this` (holds the session)
    val h = udf((v: Int, i: Int) => Hash64(v.toLong, s + i))
    val aggs = (0 until numShingles).map(i => min(h($"version", lit(i))).as(s"h$i"))
    val sortCols = (0 until numShingles).map(i => col(s"h$i")) :+ col("item")
    df.groupBy($"item")
      .agg(aggs.head, aggs.tail: _*)
      .orderBy(sortCols: _*)
      .select($"item")
      .as[Int]
      .collect()
  }

  /** Driver-side reference order (tests cross-check it against Spark). */
  def driverOrder(in: PartitionInput): Array[Int] = {
    val versionsOf = Array.fill(in.numItems)(List.empty[Int])
    for (v <- in.members.indices; item <- in.members(v)) versionsOf(item) ::= v
    val shingles: Array[Array[Long]] =
      Array.tabulate(in.numItems)(it => Array.tabulate(numShingles)(i => minHash(versionsOf(it), i)))
    val lex = new Ordering[Int] {
      def compare(a: Int, b: Int): Int = {
        var i = 0
        while (i < numShingles) {
          val c = java.lang.Long.compare(shingles(a)(i), shingles(b)(i))
          if (c != 0) return c
          i += 1
        }
        Integer.compare(a, b)
      }
    }
    (0 until in.numItems).toArray.sorted(lex)
  }

  override def partition(in: PartitionInput, capacity: Long): Assignment = {
    val order = sparkOrder(in)
    val cb = new ChunkBuilder(capacity, in.numItems)
    order.foreach(item => cb.add(item, in.itemSizes(item)))
    cb.result()
  }
}
