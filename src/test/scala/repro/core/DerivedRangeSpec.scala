package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropertyChecks
import DerivedRange._

/** Derived range bounds for expressions (paper Appendix B). */
class DerivedRangeSpec extends AnyFunSuite with PropertyChecks {

  test("Appendix-B Example 1: AVG((2c1+3c2-1)^2) derives range [0, 100]") {
    val f   = (x: Vector[Double]) => math.pow(2 * x(0) + 3 * x(1) - 1, 2)
    val box = Box(Vector(-3.0, -1.0), Vector(1.0, 3.0))
    val iv  = convexRange(f, box)
    assert(math.abs(iv.lo - 0.0) < 1e-6)
    assert(math.abs(iv.hi - 100.0) < 1e-9)
  }

  test("box validates arity and ordering") {
    assertThrows[IllegalArgumentException](Box(Vector(0.0), Vector(1.0, 2.0)))
    assertThrows[IllegalArgumentException](Box(Vector(2.0), Vector(1.0)))
  }

  test("corner enumeration yields 2^n distinct corners") {
    val box = Box(Vector(0.0, 0.0, 0.0), Vector(1.0, 2.0, 3.0))
    val cs  = corners(box).toVector
    assert(cs.size === 8)
    assert(cs.distinct.size === 8)
  }

  test("corner enumeration is guarded at 20 columns") {
    val box = Box(Vector.fill(21)(0.0), Vector.fill(21)(1.0))
    assertThrows[IllegalArgumentException](corners(box).toVector)
  }

  test("monotone range for an increasing expression") {
    val f  = (x: Vector[Double]) => 2 * x(0) + 3 * x(1)
    val iv = monotoneRange(f, Box(Vector(0.0, 1.0), Vector(2.0, 4.0)), Vector(true, true))
    assert(iv === Interval(3.0, 16.0))
  }

  test("monotone range with mixed directions") {
    val f  = (x: Vector[Double]) => x(0) - x(1)
    val iv = monotoneRange(f, Box(Vector(0.0, 0.0), Vector(2.0, 5.0)), Vector(true, false))
    assert(iv === Interval(-5.0, 2.0))
  }

  test("convex max occurs at a corner (quadratic)") {
    val f = (x: Vector[Double]) => x(0) * x(0) + x(1) * x(1)
    assert(convexMax(f, Box(Vector(-2.0, -1.0), Vector(1.0, 3.0))) === 13.0)
  }

  test("convex min finds the interior minimum of a shifted quadratic") {
    val f = (x: Vector[Double]) => (x(0) - 0.7) * (x(0) - 0.7) + (x(1) + 0.3) * (x(1) + 0.3)
    val m = convexMin(f, Box(Vector(-1.0, -1.0), Vector(1.0, 1.0)))
    assert(math.abs(m) < 1e-6)
  }

  test("convex min lands on the boundary when the unconstrained optimum is outside") {
    val f = (x: Vector[Double]) => (x(0) - 5.0) * (x(0) - 5.0)
    val m = convexMin(f, Box(Vector(0.0), Vector(1.0)))
    assert(math.abs(m - 16.0) < 1e-6)
  }

  test("concave range mirrors the convex machinery") {
    val f  = (x: Vector[Double]) => -(x(0) * x(0))
    val iv = concaveRange(f, Box(Vector(-2.0), Vector(1.0)))
    assert(math.abs(iv.lo - (-4.0)) < 1e-9)
    assert(math.abs(iv.hi - 0.0) < 1e-6)
  }

  test("random box points always fall inside the derived convex range") {
    val f   = (x: Vector[Double]) => math.pow(x(0) + 2 * x(1) - 0.5, 2) + 0.1 * x(0)
    val box = Box(Vector(-1.0, -2.0), Vector(2.0, 1.0))
    val iv  = convexRange(f, box)
    forAll(Gen.chooseNum(0.0, 1.0), Gen.chooseNum(0.0, 1.0)) { (t0, t1) =>
      val x = Vector(box.lo(0) + t0 * (box.hi(0) - box.lo(0)),
                     box.lo(1) + t1 * (box.hi(1) - box.lo(1)))
      val v = f(x)
      assert(v >= iv.lo - 1e-6 && v <= iv.hi + 1e-9)
    }
  }

  test("derived range feeds a bounder: tighter than a naive guess") {
    // AVG(c1*c2) with c1 in [0,2], c2 in [0,3]: derived range [0,6] is a
    // legal (a,b) for any range-based bounder over the transformed rows.
    val f   = (x: Vector[Double]) => x(0) * x(1)
    val iv  = monotoneRange(f, Box(Vector(0.0, 0.0), Vector(2.0, 3.0)), Vector(true, true))
    assert(iv === Interval(0.0, 6.0))
    val vals = Seq(0.5, 1.0, 2.0, 3.0, 4.5)
    val ci = Bounders.Bernstein.interval(Bounders.Bernstein.stateOf(vals), iv.lo, iv.hi, 1000L, 0.05)
    assert(ci.lo >= 0.0 && ci.hi <= 6.0)
  }
}
