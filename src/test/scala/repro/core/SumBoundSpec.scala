package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropertyChecks

/** SUM = COUNT × AVG interval combination (paper §4.1). */
class SumBoundSpec extends AnyFunSuite with PropertyChecks {

  test("positive averages reduce to the paper's [cl*gl, cr*gr]") {
    val iv = SumBound.sumInterval(Interval(100, 200), Interval(2.0, 3.0))
    assert(iv === Interval(200.0, 600.0))
  }

  test("negative averages flip the corners correctly") {
    val iv = SumBound.sumInterval(Interval(100, 200), Interval(-3.0, -2.0))
    assert(iv === Interval(-600.0, -200.0))
  }

  test("straddling-zero averages include both signs") {
    val iv = SumBound.sumInterval(Interval(100, 200), Interval(-1.0, 2.0))
    assert(iv === Interval(-200.0, 400.0))
  }

  test("negative count lower bounds are floored at zero") {
    val iv = SumBound.sumInterval(Interval(-50, 100), Interval(1.0, 2.0))
    assert(iv.lo === 0.0)
    assert(iv.hi === 200.0)
  }

  test("every (count, avg) pair in the box has its product inside the interval") {
    val boxes = for {
      cl <- Gen.chooseNum(0.0, 1000.0); cw <- Gen.chooseNum(0.0, 500.0)
      gl <- Gen.chooseNum(-50.0, 50.0); gw <- Gen.chooseNum(0.0, 20.0)
      tc <- Gen.chooseNum(0.0, 1.0); tg <- Gen.chooseNum(0.0, 1.0)
    } yield (Interval(cl, cl + cw), Interval(gl, gl + gw), tc, tg)
    forAll(boxes) { case (cIv, gIv, tc, tg) =>
      val sIv = SumBound.sumInterval(cIv, gIv)
      val c   = cIv.lo + tc * cIv.width
      val g   = gIv.lo + tg * gIv.width
      assert(sIv.contains(c * g) || c < 0,
        s"product ${c * g} outside $sIv for c=$c g=$g")
    }
  }

  test("degenerate intervals give a degenerate product") {
    val iv = SumBound.sumInterval(Interval(10, 10), Interval(2.5, 2.5))
    assert(iv === Interval(25.0, 25.0))
  }
}
