package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import repro.NaiveReference

/** Randomized H-index laws via ScalaCheck's own sbt framework (the
  * scalatest bridge artifact is unavailable offline).
  */
object HIndexProperties extends Properties("HIndex") {

  private val values = Gen.listOf(Gen.choose(0, 30))

  property("matches sort-based reference") = Prop.forAll(values) { vs =>
    HIndex.hIndex(vs) == NaiveReference.hIndex(vs)
  }

  property("definitional bound: >= h values are >= h") = Prop.forAll(values) { vs =>
    val h = HIndex.hIndex(vs)
    vs.count(_ >= h) >= h && vs.count(_ >= h + 1) < h + 1
  }

  property("permutation invariant") = Prop.forAll(values, Gen.long) { (vs, seed) =>
    HIndex.hIndex(new scala.util.Random(seed).shuffle(vs)) == HIndex.hIndex(vs)
  }

  property("monotone in pointwise increase") = Prop.forAll(values) { vs =>
    HIndex.hIndex(vs.map(_ + 1)) >= HIndex.hIndex(vs)
  }

  property("bounded overload = min(cap, h)") =
    Prop.forAll(values, Gen.choose(0, 15)) { (vs, cap) =>
      HIndex.boundedHIndex(vs, cap) == math.min(cap, HIndex.hIndex(vs))
    }
}
