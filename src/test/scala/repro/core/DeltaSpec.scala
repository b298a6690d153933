package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class DeltaSpec extends AnyFunSuite {

  private def randomMembers(rnd: Random, n: Int): Array[Long] =
    Array.fill(n)(Ck.pack(rnd.nextInt(1000).toLong, rnd.nextInt(50))).distinct.sorted

  test("between + applyTo roundtrips parent to child") {
    val rnd = new Random(7)
    (0 until 100).foreach { _ =>
      val p = randomMembers(rnd, 80)
      val c = randomMembers(rnd, 80)
      val d = Delta.between(p, c)
      assert(d.applyTo(p).toSeq == c.toSeq)
    }
  }

  test("invert roundtrips child to parent") {
    val rnd = new Random(8)
    (0 until 100).foreach { _ =>
      val p = randomMembers(rnd, 60)
      val c = randomMembers(rnd, 60)
      val d = Delta.between(p, c)
      assert(d.invert.applyTo(c).toSeq == p.toSeq)
    }
  }

  test("deltas from between are always consistent (Δ⁺ ∩ Δ⁻ = ∅)") {
    val rnd = new Random(9)
    (0 until 100).foreach { _ =>
      val d = Delta.between(randomMembers(rnd, 70), randomMembers(rnd, 70))
      assert(d.isConsistent)
    }
  }

  test("inconsistent delta is detected") {
    val ck = Ck.pack(1, 1)
    assert(!Delta(Array(ck), Array(ck)).isConsistent)
  }

  test("empty delta leaves membership unchanged") {
    val m = Array(Ck.pack(1, 0), Ck.pack(2, 0))
    assert(Delta.empty.applyTo(m).toSeq == m.toSeq)
  }

  test("delta symmetry: Δ⁺_ij = Δ⁻_ji") {
    val rnd = new Random(10)
    (0 until 50).foreach { _ =>
      val p = randomMembers(rnd, 40)
      val c = randomMembers(rnd, 40)
      val fwd = Delta.between(p, c)
      val bwd = Delta.between(c, p)
      assert(fwd.adds.toSeq == bwd.dels.toSeq)
      assert(fwd.dels.toSeq == bwd.adds.toSeq)
    }
  }

  test("numChanges counts both sides") {
    val d = Delta(Array(Ck.pack(1, 1)), Array(Ck.pack(1, 0), Ck.pack(2, 0)))
    assert(d.numChanges == 3)
  }

  test("example 2 deltas: V1 derived from V0") {
    // Δ0,1 = {+<K3,V1>, +<K4,V1>, -<K3,V0>}
    val v0 = Array(Ck.pack(0, 0), Ck.pack(1, 0), Ck.pack(2, 0), Ck.pack(3, 0))
    val d01 = Delta(Array(Ck.pack(3, 1), Ck.pack(4, 1)).sorted, Array(Ck.pack(3, 0)))
    val v1 = d01.applyTo(v0)
    assert(v1.toSet == Set(Ck.pack(0, 0), Ck.pack(1, 0), Ck.pack(2, 0), Ck.pack(3, 1), Ck.pack(4, 1)))
  }
}
