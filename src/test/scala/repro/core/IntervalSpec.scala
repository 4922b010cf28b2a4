package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class IntervalSpec extends AnyFunSuite {

  private val rng = new Random(1)

  test("full interval contains everything") {
    assert(Interval.Full.contains(0))
    assert(Interval.Full.contains(Double.MaxValue))
    assert(Interval.Full.contains(-1e308))
  }

  test("point interval is a point") {
    val p = Interval.point(3.5)
    assert(p.isPoint)
    assert(p.contains(3.5))
    assert(!p.contains(3.4999))
  }

  test("empty after disjoint intersection") {
    assert(Interval(0, 1).intersect(Interval(2, 3)).isEmpty)
  }

  test("intersection is commutative and contained in both") {
    (1 to 200).foreach { _ =>
      val Seq(a, b, c, d) = Seq.fill(4)(rng.nextDouble() * 100 - 50)
      val i1 = Interval(math.min(a, b), math.max(a, b))
      val i2 = Interval(math.min(c, d), math.max(c, d))
      val m  = i1.intersect(i2)
      assert(m == i2.intersect(i1))
      if (!m.isEmpty) {
        assert(i1.contains(m.lo) && i1.contains(m.hi))
        assert(i2.contains(m.lo) && i2.contains(m.hi))
      }
    }
  }

  test("intersection with Full is identity") {
    (1 to 50).foreach { _ =>
      val a = rng.nextDouble() * 10; val b = a + rng.nextDouble() * 10
      assert(Interval(a, b).intersect(Interval.Full) == Interval(a, b))
    }
  }

  test("affine map with positive scale preserves order") {
    assert(Interval(10, 20).mapAffine(offset = 5, scale = 2) == Interval(10, 30))
  }

  test("affine map with negative scale flips the interval") {
    assert(Interval(10, 20).mapAffine(offset = 0, scale = -1) == Interval(-20, -10))
  }

  test("affine map matches pointwise scaler semantics") {
    (1 to 200).foreach { _ =>
      val x = rng.nextDouble() * 200 - 100
      val o = rng.nextDouble() * 20 - 10
      val s = rng.nextDouble() * 4 - 2
      val iv = Interval.point(x).mapAffine(o, s)
      val y  = (x - o) * s
      assert(math.abs(iv.lo - y) < 1e-9 && math.abs(iv.hi - y) < 1e-9)
    }
  }

  test("affine image of any member is inside the image interval") {
    (1 to 200).foreach { _ =>
      val lo = rng.nextDouble() * 50 - 25
      val hi = lo + rng.nextDouble() * 50
      val o  = rng.nextDouble() * 10 - 5
      val s  = rng.nextDouble() * 4 - 2
      val x  = lo + rng.nextDouble() * (hi - lo)
      val img = Interval(lo, hi).mapAffine(o, s)
      val y = (x - o) * s
      assert(y >= img.lo - 1e-9 && y <= img.hi + 1e-9)
    }
  }

  test("affine map of a point is a point") {
    assert(Interval.point(2).mapAffine(1, 3.0) == Interval.point(3.0))
  }

  test("NaN bounds rejected") {
    assertThrows[IllegalArgumentException](Interval(Double.NaN, 0))
  }

  test("feature bounds default to unconstrained") {
    val fb = FeatureBounds.Empty
    assert(fb(7) == Interval.Full)
    assert(!fb.isConstrained(7))
    assert(fb.constantOf(7).isEmpty)
  }

  test("feature bounds report point constants") {
    val fb = FeatureBounds(Map(2 -> Interval.point(1.0), 3 -> Interval(0, 1)))
    assert(fb.constantOf(2).contains(1.0))
    assert(fb.constantOf(3).isEmpty)
    assert(fb.isConstrained(3))
  }
}
