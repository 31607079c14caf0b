package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Empirical SSI coverage: Monte-Carlo over without-replacement samples,
  * asserting the failure rate never exceeds δ (Definition 1). Conservative
  * bounders should in fact fail (almost) never at these settings.
  */
class CoverageSpec extends AnyFunSuite {

  private val N      = 2000
  private val m      = 150
  private val delta  = 0.1
  private val trials = 300

  private def dataset(kind: String): Array[Double] = {
    val rng = new Random(kind.hashCode.toLong)
    kind match {
      case "uniform" => Array.fill(N)(rng.nextDouble())
      case "heavy-tail" =>
        Array.fill(N)(0.1 * rng.nextDouble() + (if (rng.nextInt(100) == 0) 0.9 * rng.nextDouble() else 0.0))
      case "bimodal" =>
        Array.fill(N)(if (rng.nextBoolean()) 0.2 + 0.02 * rng.nextGaussian() else 0.8 + 0.02 * rng.nextGaussian())
          .map(v => math.min(1.0, math.max(0.0, v)))
      case other => throw new IllegalArgumentException(other)
    }
  }

  private def failures(bd: AnyBounder, data: Array[Double]): Int = {
    val mu  = data.sum / data.length
    val rng = new Random(7L)
    var fails = 0
    var t = 0
    while (t < trials) {
      val idx = rng.shuffle((0 until N).toVector).take(m)
      val vs  = idx.map(data)
      val iv  = bd.iv(vs, 0.0, 1.0, N.toLong, delta)
      if (!iv.contains(mu)) fails += 1
      t += 1
    }
    fails
  }

  private def coverageBounders: Seq[AnyBounder] =
    (Bounders.all).map(AnyBounder.of(_)) ++ Seq(
      AnyBounder.of(AndersonDkw),
      AnyBounder.of(RangeTrimStreaming(HoeffdingSerfling)),
      AnyBounder.of(RangeTrimStreaming(EmpiricalBernsteinSerfling)))

  for {
    bd   <- coverageBounders
    kind <- Seq("uniform", "heavy-tail", "bimodal")
  } test(s"[${bd.name}] coverage on $kind data: failure rate <= delta") {
    val fails = failures(bd, dataset(kind))
    val allowance = math.max(3.0, delta * trials) // binomial slack; conservative bounders hit ~0
    assert(fails <= allowance, s"$fails/$trials failures at delta=$delta")
  }

  test("known-variance Bernstein-Serfling covers with the true sigma") {
    val data  = dataset("uniform")
    val sigma = {
      val mu = data.sum / data.length
      math.sqrt(data.map(v => (v - mu) * (v - mu)).sum / data.length)
    }
    val fails = failures(AnyBounder.of(BernsteinSerfling(sigma)), data)
    assert(fails <= math.max(3.0, delta * trials))
  }
}
