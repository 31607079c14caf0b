package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces the paper's Table 2 classification via the behavioral
  * detectors: Hoeffding has PMA+PHOS, Bernstein only PHOS, Anderson/DKW
  * only PMA, and RangeTrim removes PHOS from whatever it wraps.
  */
class PathologiesSpec extends AnyFunSuite {

  test("Hoeffding-Serfling exhibits PMA") {
    assert(Pathologies.exhibitsPMA(Bounders.Hoeffding))
  }

  test("Hoeffding-Serfling exhibits PHOS") {
    assert(Pathologies.exhibitsPHOS(Bounders.Hoeffding))
  }

  test("empirical Bernstein-Serfling does not exhibit PMA") {
    assert(!Pathologies.exhibitsPMA(Bounders.Bernstein))
  }

  test("empirical Bernstein-Serfling exhibits PHOS") {
    assert(Pathologies.exhibitsPHOS(Bounders.Bernstein))
  }

  test("Anderson/DKW exhibits PMA") {
    assert(Pathologies.exhibitsPMA(AndersonDkw))
  }

  test("Anderson/DKW does not exhibit PHOS") {
    assert(!Pathologies.exhibitsPHOS(AndersonDkw))
  }

  test("Hoeffding+RT does not exhibit PHOS (RangeTrim fixes PHOS)") {
    assert(!Pathologies.exhibitsPHOS(Bounders.HoeffdingRT))
  }

  test("Hoeffding+RT still exhibits PMA (RangeTrim does not fix PMA)") {
    assert(Pathologies.exhibitsPMA(Bounders.HoeffdingRT))
  }

  test("Bernstein+RT exhibits neither PMA nor PHOS (paper Problem 1 solved)") {
    assert(!Pathologies.exhibitsPMA(Bounders.BernsteinRT))
    assert(!Pathologies.exhibitsPHOS(Bounders.BernsteinRT))
  }

  test("Definition-2 clip probe: Hoeffding width ignores clipped values") {
    assert(!Pathologies.widthRespondsToClipping(Bounders.Hoeffding))
  }

  test("Definition-2 clip probe: Bernstein width responds to clipped values") {
    assert(Pathologies.widthRespondsToClipping(Bounders.Bernstein))
  }

  test("Definition-2 clip probe: Anderson/DKW lower bound responds to clipped values") {
    assert(Pathologies.widthRespondsToClipping(AndersonDkw))
  }

  test("PHOS detector clauses individually: Hoeffding Lbound depends on b") {
    val vs = Pathologies.interiorSample(200, 0.0, 1.0)
    assert(Pathologies.lboundDependsOnB(Bounders.Hoeffding, vs, 0.0, 1.0, 100000L, 0.05))
    assert(Pathologies.rboundDependsOnA(Bounders.Hoeffding, vs, 0.0, 1.0, 100000L, 0.05))
  }

  test("PHOS detector clauses individually: RT bounders depend on neither far bound") {
    val vs = Pathologies.interiorSample(200, 0.0, 1.0)
    for (bd <- Seq(Bounders.HoeffdingRT, Bounders.BernsteinRT)) {
      assert(!Pathologies.lboundDependsOnB(bd, vs, 0.0, 1.0, 100000L, 0.05))
      assert(!Pathologies.rboundDependsOnA(bd, vs, 0.0, 1.0, 100000L, 0.05))
    }
  }

  test("endpoint sensitivity ratio is ~1 for Hoeffding (width is all endpoint)") {
    val r = Pathologies.endpointSensitivityRatio(
      Bounders.Hoeffding, Pathologies.interiorSample(512, 0.0, 1.0), 0.0, 1.0, 1000000L, 0.05)
    assert(r > 0.8 && r < 1.2)
  }

  test("interior sample stays within the central band") {
    val vs = Pathologies.interiorSample(1000, -5.0, 5.0)
    assert(vs.forall(v => v >= -5.0 + 3.0 && v <= -5.0 + 7.0))
  }
}
