package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class TypesSpec extends AnyFunSuite {
  private val rnd = new Random(1)
  private def randomPairs(n: Int): Seq[(Long, Int)] =
    Seq.fill(n)((rnd.nextLong((1L << 42) - 1).abs, rnd.nextInt(Ck.MaxVersions)))

  test("pack/unpack roundtrips the key component") {
    randomPairs(500).foreach { case (k, v) => assert(Ck.key(Ck.pack(k, v)) == k) }
  }

  test("pack/unpack roundtrips the version component") {
    randomPairs(500).foreach { case (k, v) => assert(Ck.version(Ck.pack(k, v)) == v) }
  }

  test("packed keys sort primarily by key, then by version") {
    val cks = Seq(Ck.pack(2, 0), Ck.pack(1, 5), Ck.pack(1, 2), Ck.pack(0, 9)).sorted
    assert(cks.map(Ck.key) == Seq(0L, 1L, 1L, 2L))
    assert(cks.map(Ck.version) == Seq(9, 2, 5, 0))
  }

  test("pack rejects out-of-range versions") {
    intercept[IllegalArgumentException](Ck.pack(1, Ck.MaxVersions))
    intercept[IllegalArgumentException](Ck.pack(1, -1))
  }

  test("pack rejects out-of-range keys") {
    intercept[IllegalArgumentException](Ck.pack(-1, 0))
    intercept[IllegalArgumentException](Ck.pack(1L << 43, 0))
  }

  test("show renders the composite key") {
    assert(Ck.show(Ck.pack(3, 1)) == "<K3,V1>")
  }

  test("Hash64 is deterministic") {
    (0 until 200).foreach { i =>
      val (x, s) = (rnd.nextLong(), rnd.nextLong())
      assert(Hash64(x, s) == Hash64(x, s))
      assert(Hash64(x, s) == Hash64(x, s))
      val _ = i
    }
  }

  test("Hash64 differs across seeds (spot check)") {
    val collisions = (0 until 1000).count(i => Hash64(i, 1) == Hash64(i, 2))
    assert(collisions == 0)
  }

  test("Hash64.nonNeg is non-negative") {
    (0 until 1000).foreach { _ =>
      assert(Hash64.nonNeg(rnd.nextLong(), rnd.nextLong()) >= 0)
    }
  }
}
