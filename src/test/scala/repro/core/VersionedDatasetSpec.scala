package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.{DatasetSpec, VersionedDataGen}

import scala.collection.mutable

/** Tests over the dataset model, including the paper's Example 2. */
class VersionedDatasetSpec extends AnyFunSuite {

  /** Example 2 / Fig 1: five versions, nine distinct records. */
  def example2: VersionedDataset = {
    val tree = VersionTree(-1, 0, 0, 1, 2) // V1,V2 from V0; V3 from V1; V4 from V2
    def ck(k: Int, v: Int) = Ck.pack(k.toLong, v)
    val deltas = Array(
      Delta(Array(ck(0, 0), ck(1, 0), ck(2, 0), ck(3, 0)), Array.emptyLongArray),
      Delta(Array(ck(3, 1), ck(4, 1)).sorted, Array(ck(3, 0))),
      Delta(Array(ck(3, 2), ck(5, 2)).sorted, Array(ck(2, 0), ck(3, 0)).sorted),
      Delta(Array.emptyLongArray, Array(ck(2, 0))),
      Delta(Array(ck(3, 4)), Array(ck(3, 2))),
    )
    val lineage = mutable.LongMap(
      ck(3, 1).toLong -> ck(3, 0), ck(3, 2).toLong -> ck(3, 0), ck(3, 4).toLong -> ck(3, 2))
    new VersionedDataset(DatasetSpec("ex2", 5, 4, 0.3, skewed = false, 2), tree, deltas, lineage)
  }

  test("example 2: nine distinct records") {
    assert(example2.uniqueCks.length == 9)
  }

  test("example 2: version memberships match Fig 1") {
    val ds = example2
    def ck(k: Int, v: Int) = Ck.pack(k.toLong, v)
    assert(ds.members(0).toSet == Set(ck(0, 0), ck(1, 0), ck(2, 0), ck(3, 0)))
    assert(ds.members(1).toSet == Set(ck(0, 0), ck(1, 0), ck(2, 0), ck(3, 1), ck(4, 1)))
    assert(ds.members(2).toSet == Set(ck(0, 0), ck(1, 0), ck(3, 2), ck(5, 2)))
    assert(ds.members(3).toSet == Set(ck(0, 0), ck(1, 0), ck(3, 1), ck(4, 1)))
    assert(ds.members(4).toSet == Set(ck(0, 0), ck(1, 0), ck(3, 4), ck(5, 2)))
  }

  test("example 2: version-to-record lookup finds <K3,V1> for K3 in V3") {
    assert(example2.originOf(3, 3L) == 1)
  }

  test("example 2: record retrieval must not just use <K,V> (K3 originated earlier)") {
    val ds = example2
    assert(ds.originOf(4, 3L) == 4)
    assert(ds.originOf(2, 3L) == 2)
    assert(ds.originOf(0, 3L) == 0)
    assert(!ds.isLive(2, 2L)) // K2 deleted in V2
    assert(ds.isLive(1, 2L))
  }

  test("example 2: evolution of K3 has four records") {
    val ds = example2
    assert(ds.recordsOfKey(3L).map(Ck.version).toSeq == Seq(0, 1, 2, 4))
  }

  val specs: Seq[DatasetSpec] = Seq(
    DatasetSpec.tiny("t1", 20, 100, skewed = false, 1, seed = 1),
    DatasetSpec.tiny("t2", 30, 120, skewed = true, 3, seed = 2),
    DatasetSpec.tiny("t3", 40, 80, skewed = false, 5, seed = 3),
  )

  for (spec <- specs) {
    val ds = VersionedDataGen.generate(spec)

    test(s"${spec.name}: generation is deterministic") {
      val ds2 = VersionedDataGen.generate(spec)
      assert(ds.uniqueCks.toSeq == ds2.uniqueCks.toSeq)
      assert(ds.members.map(_.toSeq).toSeq == ds2.members.map(_.toSeq).toSeq)
      assert(ds.tree.parent.toSeq == ds2.tree.parent.toSeq)
    }

    test(s"${spec.name}: every version has at most one record per key") {
      ds.members.foreach { m =>
        val keys = m.map(Ck.key)
        assert(keys.distinct.length == keys.length)
      }
    }

    test(s"${spec.name}: record origins are ancestors of the containing version") {
      (0 until ds.tree.size).foreach { v =>
        val anc = ds.tree.pathFromRoot(v).toSet
        ds.members(v).foreach(ck => assert(anc.contains(Ck.version(ck))))
      }
    }

    test(s"${spec.name}: every record appears in its origin version") {
      ds.uniqueCks.foreach { ck =>
        assert(java.util.Arrays.binarySearch(ds.members(Ck.version(ck)), ck) >= 0)
      }
    }

    test(s"${spec.name}: record presence is connected toward the origin") {
      // if ck is in v, it is in every version on the path origin→v
      (0 until ds.tree.size).foreach { v =>
        ds.members(v).foreach { ck =>
          var u = v
          while (u != Ck.version(ck)) {
            u = ds.tree.parent(u)
            assert(java.util.Arrays.binarySearch(ds.members(u), ck) >= 0,
              s"${Ck.show(ck)} in $v but missing at $u")
          }
        }
      }
    }

    test(s"${spec.name}: unique records = all delta additions") {
      assert(ds.uniqueCks.length == ds.deltas.map(_.adds.length).sum)
    }

    test(s"${spec.name}: deltas are consistent") {
      ds.deltas.foreach(d => assert(d.isConsistent))
    }

    test(s"${spec.name}: lineage points to a record of the same key in the parent version") {
      ds.lineageMap.foreach { case (ck, parentCk) =>
        assert(Ck.key(ck) == Ck.key(parentCk))
        assert(Ck.version(parentCk) < Ck.version(ck))
      }
    }

    test(s"${spec.name}: version sizes stay near the root size") {
      val sizes = ds.members.map(_.length)
      assert(sizes.min > spec.rootRecords / 2)
      assert(sizes.max < spec.rootRecords * 2)
    }

    test(s"${spec.name}: stats are internally consistent") {
      val st = ds.stats
      assert(st.uniqueRecords == ds.uniqueCks.length)
      assert(st.totalBytes >= st.uniqueBytes)
      assert(st.nVersions == spec.nVersions)
      assert(math.abs(st.avgDepth - ds.tree.avgLeafDepth) < 1e-9)
    }

    test(s"${spec.name}: itemVersionCounts sums to total membership") {
      assert(ds.itemVersionCounts.map(_.toLong).sum == ds.members.map(_.length.toLong).sum)
    }

    test(s"${spec.name}: prefix is a consistent sub-dataset") {
      val pre = ds.prefix(spec.nVersions / 2)
      assert(pre.tree.size == spec.nVersions / 2)
      (0 until pre.tree.size).foreach { v =>
        assert(pre.members(v).toSeq == ds.members(v).toSeq)
      }
    }
  }

  test("chains have avg depth (n+1)/2") {
    val ds = VersionedDataGen.generate(DatasetSpec.tiny("chain", 21, 50, skewed = false, 1))
    assert(ds.tree.avgDepth == 11.0)
  }

  test("skewed updates concentrate on low keys") {
    val spec = DatasetSpec.tiny("skewcheck", 40, 200, skewed = true, 1, seed = 5)
    val ds = VersionedDataGen.generate(spec)
    // iterate entries (not .keys, which is a Set) to count modification events
    val modKeys = ds.lineageMap.iterator.map(kv => Ck.key(kv._1)).toSeq
    val lowHalf = modKeys.count(_ < 100)
    assert(lowHalf > modKeys.size * 6 / 10, s"expected low-key bias, got $lowHalf/${modKeys.size}")
  }
}
