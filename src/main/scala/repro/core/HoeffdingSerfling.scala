package repro.core

/** Hoeffding–Serfling error bounder (paper Algorithm 1; Serfling 1974).
  *
  * For a without-replacement sample of size m from N values in [a, b]:
  *
  *   ε = (b − a) · √( log(1/δ) · (1 − (m−1)/N) / (2m) )
  *
  * and the (1−δ) confidence lower / upper bounds are ĝ ∓ ε. Width depends
  * only on (b − a) and m, so this bounder exhibits both PMA and PHOS
  * (paper Table 2); it is the conservative-AQP incumbent baseline.
  */
object HoeffdingSerfling extends MomentBounder {

  override def name: String = "Hoeffding"

  /** The ε of Algorithm 1 line 8. Infinite when m = 0 (no information). */
  def epsilon(m: Long, a: Double, b: Double, n: Long, delta: Double): Double = {
    if (m <= 0) Double.PositiveInfinity
    else (b - a) * math.sqrt(math.log(1.0 / delta) * ErrorBounder.rhoSerfling(m, n) / (2.0 * m))
  }

  override def lbound(s: MomentState, a: Double, b: Double, n: Long, delta: Double): Double =
    if (s.isEmpty) a else s.mean - epsilon(s.m, a, b, n, delta)

  override def rbound(s: MomentState, a: Double, b: Double, n: Long, delta: Double): Double =
    if (s.isEmpty) b else s.mean + epsilon(s.m, a, b, n, delta)
}
