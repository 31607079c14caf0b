package repro.core

/** Anderson/DKW error bounder (paper Algorithm 3; Anderson 1969, DKW 1956
  * with Massart's constant).
  *
  * Keeps the whole sample (O(m) memory, paper Table 2) and bounds the mean
  * through uniform CDF bounds: for the one-sided deviation
  * ε = √(log(1/δ)/(2m)), the lower confidence bound moves the ε-fraction
  * *largest* observed mass down to the range floor `a`:
  *
  *   Lbound = ε·a + (1−ε)·AVG({x ∈ S : F̂(x) ≤ 1−ε})
  *
  * The displaced mass comes from the sample's own upper tail and never
  * references `b`, so this bounder is PHOS-free — but it lands all of that
  * mass exactly at `a`, which is PMA (paper §2.3.3, Figure 3). Valid for
  * without-replacement samples from a finite dataset by the paper's
  * Theorem 1 (App. C).
  *
  * State is the multiset of observed values; bounds sort on demand.
  */
object AndersonDkw extends ErrorBounder[Vector[Double]] {

  override def name: String = "Anderson/DKW"

  override def init: Vector[Double] = Vector.empty

  override def update(s: Vector[Double], v: Double): Vector[Double] = s :+ v

  override def merge(a: Vector[Double], b: Vector[Double]): Vector[Double] = a ++ b

  override def count(s: Vector[Double]): Long = s.size.toLong

  override def mean(s: Vector[Double]): Double =
    if (s.isEmpty) 0.0 else s.sum / s.size

  /** One-sided DKW deviation ε = √(log(1/δ)/(2m)). */
  def epsilon(m: Long, delta: Double): Double =
    if (m <= 0) 1.0 else math.min(1.0, math.sqrt(math.log(1.0 / delta) / (2.0 * m)))

  override def lbound(s: Vector[Double], a: Double, b: Double, n: Long, delta: Double): Double = {
    if (s.isEmpty) a
    else {
      val m      = s.size
      val eps    = epsilon(m, delta)
      // Keep the k smallest values, k = ⌊(1−ε)·m⌋ (F̂(x) ≤ 1−ε ⇔ rank ≤ (1−ε)m).
      val k      = math.floor((1.0 - eps) * m).toInt
      if (k <= 0) a
      else {
        val kept = s.sorted.take(k)
        eps * a + (1.0 - eps) * (kept.sum / k)
      }
    }
  }

  /** Algorithm 3 line 10: reflect the sample through (a+b) and reuse Lbound. */
  override def rbound(s: Vector[Double], a: Double, b: Double, n: Long, delta: Double): Double =
    (a + b) - lbound(s.map(v => (a + b) - v), a, b, n, delta)
}
