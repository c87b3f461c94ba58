package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.NaiveReference

/** The H-index primitive against hand cases and the sort-based reference. */
class HIndexSpec extends AnyFunSuite {

  test("hand cases") {
    assert(HIndex.hIndex(Seq.empty) == 0)
    assert(HIndex.hIndex(Seq(0)) == 0)
    assert(HIndex.hIndex(Seq(1)) == 1)
    assert(HIndex.hIndex(Seq(5)) == 1)
    assert(HIndex.hIndex(Seq(1, 1, 1)) == 1)
    assert(HIndex.hIndex(Seq(3, 3, 3)) == 3)
    assert(HIndex.hIndex(Seq(4, 4, 4, 4, 4)) == 4)
    assert(HIndex.hIndex(Seq(10, 8, 5, 4, 3)) == 4)
    assert(HIndex.hIndex(Seq(25, 8, 5, 3, 3)) == 3)
  }

  test("definition: at least h values are >= h, and not h+1") {
    for (seed <- 0 until 50) {
      val rng = new scala.util.Random(seed)
      val vals = Seq.fill(rng.nextInt(20))(rng.nextInt(15))
      val h = HIndex.hIndex(vals)
      assert(vals.count(_ >= h) >= h)
      assert(vals.count(_ >= h + 1) < h + 1)
    }
  }

  test("matches the sort-based reference implementation") {
    for (seed <- 0 until 100) {
      val rng  = new scala.util.Random(1000 + seed)
      val vals = Seq.fill(rng.nextInt(30))(rng.nextInt(20))
      assert(HIndex.hIndex(vals) == NaiveReference.hIndex(vals), vals.toString)
    }
  }

  test("bounded by size and by max") {
    for (seed <- 0 until 30) {
      val rng  = new scala.util.Random(2000 + seed)
      val vals = Seq.fill(1 + rng.nextInt(25))(rng.nextInt(12))
      val h = HIndex.hIndex(vals)
      assert(h <= vals.size && h <= vals.max)
    }
  }

  test("monotone: adding an element never decreases the h-index") {
    for (seed <- 0 until 30) {
      val rng  = new scala.util.Random(3000 + seed)
      val vals = Seq.fill(rng.nextInt(15))(rng.nextInt(10))
      assert(HIndex.hIndex(vals :+ rng.nextInt(10)) >= HIndex.hIndex(vals))
    }
  }

  test("boundedHIndex equals min(cap, hIndex)") {
    for (seed <- 0 until 50; cap <- Seq(0, 1, 2, 3, 5, 100)) {
      val rng  = new scala.util.Random(4000 + seed)
      val vals = Seq.fill(rng.nextInt(20))(rng.nextInt(15))
      assert(HIndex.boundedHIndex(vals, cap) == math.min(cap, HIndex.hIndex(vals)))
    }
  }

  test("array-slice overload agrees with the Iterable form") {
    for (seed <- 0 until 50) {
      val rng = new scala.util.Random(5000 + seed)
      val arr = Array.fill(30)(rng.nextInt(15))
      val len = rng.nextInt(31)
      val cap = rng.nextInt(10)
      assert(HIndex.boundedHIndex(arr, len, cap) ==
             HIndex.boundedHIndex(arr.take(len).toSeq, cap))
    }
  }

  test("rejects negative values in the checked form") {
    intercept[IllegalArgumentException](HIndex.hIndex(Seq(3, -1)))
  }
}
