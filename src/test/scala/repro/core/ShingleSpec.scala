package repro.core

import repro.SparkSpec
import repro.data.{DatasetSpec, VersionedDataGen}

class ShingleSpec extends SparkSpec {

  private lazy val ds = VersionedDataGen.generate(
    DatasetSpec.tiny("shingle", 25, 80, skewed = false, 3, seed = 71))
  private lazy val in = PartitionInput(ds.tree, ds.membersItems, ds.itemSizes)

  test("spark order equals the driver reference order") {
    val p = new ShinglePartitioner(spark)
    assert(p.sparkOrder(in).toSeq == p.driverOrder(in).toSeq)
  }

  test("order is a permutation of all items") {
    val p = new ShinglePartitioner(spark)
    assert(p.sparkOrder(in).sorted.toSeq == (0 until in.numItems))
  }

  test("items with identical version sets sort into one shingle-equal run") {
    val p = new ShinglePartitioner(spark)
    val order = p.driverOrder(in)
    val versionSets = Array.fill(in.numItems)(Set.empty[Int])
    for (v <- in.members.indices; it <- in.members(v)) versionSets(it) += v
    def shingles(it: Int): Seq[Long] =
      (0 until 4).map(i => versionSets(it).map(v => Hash64(v.toLong, 0x5417L + i)).min)
    val pos = new Array[Int](in.numItems)
    order.zipWithIndex.foreach { case (it, i) => pos(it) = i }
    versionSets.zipWithIndex.groupBy(_._1).values.foreach { grp =>
      // identical version sets → identical shingle vectors; anything sorted
      // between them must carry the same shingle vector (min-hash ties)
      val vec = shingles(grp.head._2)
      grp.foreach(g => assert(shingles(g._2) == vec))
      val ps = grp.map(g => pos(g._2)).sorted
      (ps.head to ps.last).foreach(i => assert(shingles(order(i)) == vec,
        "a non-tied item interleaves an identical-set run"))
    }
  }

  test("more shingles refine the ordering deterministically") {
    val p1 = new ShinglePartitioner(spark, numShingles = 2)
    val p2 = new ShinglePartitioner(spark, numShingles = 6)
    assert(p1.driverOrder(in).toSeq != p2.driverOrder(in).toSeq || in.numItems < 2)
    assert(p2.driverOrder(in).toSeq == p2.driverOrder(in).toSeq)
  }

  test("seed changes the order but not completeness") {
    val pa = new ShinglePartitioner(spark, seed = 1)
    val pb = new ShinglePartitioner(spark, seed = 2)
    val oa = pa.driverOrder(in)
    val ob = pb.driverOrder(in)
    assert(oa.sorted.toSeq == ob.sorted.toSeq)
  }
}
