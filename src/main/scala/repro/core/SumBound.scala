package repro.core

/** SUM confidence bounds (paper §4.1, "Computing CIs for SUM").
  *
  * SUM(V) = N · AVG(V); given a (1−δ/2) CI [c_ℓ, c_r] for the COUNT N and a
  * (1−δ/2) CI [g_ℓ, g_r] for the AVG, a union bound makes the product box a
  * (1−δ) region. The paper states the combined CI as [c_ℓ·g_ℓ, c_r·g_r],
  * which is correct when g_ℓ ≥ 0; we take the min/max over the box corners
  * so the combination also holds for averages that may be negative
  * (DepDelay, for instance, is).
  */
object SumBound {

  /** (1−δ) CI for SUM from a COUNT CI (count ≥ 0 enforced) and an AVG CI,
    * each valid at level 1−δ/2.
    */
  def sumInterval(countCi: Interval, avgCi: Interval): Interval = {
    val cl = math.max(0.0, countCi.lo)
    val cr = math.max(cl, countCi.hi)
    val corners =
      Seq(cl * avgCi.lo, cl * avgCi.hi, cr * avgCi.lo, cr * avgCi.hi)
    Interval(corners.min, corners.max)
  }
}
