package repro.core

import org.scalacheck.{Gen, Prop, Properties}

/** ScalaCheck properties for the delta algebra (§3.2). */
object DeltaProps extends Properties("Delta") {

  private val genMembers: Gen[Array[Long]] =
    Gen.listOf(Gen.zip(Gen.chooseNum(0L, 500L), Gen.chooseNum(0, 30)))
      .map(_.map { case (k, v) => Ck.pack(k, v) }.distinct.sorted.toArray)

  property("between+applyTo reconstructs the child") =
    Prop.forAll(genMembers, genMembers) { (p, c) =>
      Delta.between(p, c).applyTo(p).toSeq == c.toSeq
    }

  property("invert reconstructs the parent") =
    Prop.forAll(genMembers, genMembers) { (p, c) =>
      Delta.between(p, c).invert.applyTo(c).toSeq == p.toSeq
    }

  property("between produces consistent deltas") =
    Prop.forAll(genMembers, genMembers) { (p, c) =>
      Delta.between(p, c).isConsistent
    }

  property("delta symmetry") =
    Prop.forAll(genMembers, genMembers) { (p, c) =>
      val f = Delta.between(p, c)
      val b = Delta.between(c, p)
      f.adds.toSeq == b.dels.toSeq && f.dels.toSeq == b.adds.toSeq
    }

  property("identical versions yield the empty delta") =
    Prop.forAll(genMembers) { m =>
      Delta.between(m, m).numChanges == 0
    }

  property("applyTo preserves sortedness") =
    Prop.forAll(genMembers, genMembers) { (p, c) =>
      val out = Delta.between(p, c).applyTo(p)
      out.toSeq == out.sorted.toSeq
    }
}
