package repro.core

/** Optional-stopping support (paper Algorithm 5, "OptStop").
  *
  * Sampling proceeds in rounds; at the end of round k the error probability
  * handed to the bounder is decayed to δₖ = (6/π²)·δ/k², so that
  * Σₖ δₖ = δ (Theorem 4) and the *running intersection* of per-round
  * intervals is a sequentially valid (1−δ) CI — recomputing a fixed-δ CI
  * every round would silently forfeit the guarantee (the mistake the paper
  * calls out in [20]).
  */
object OptStop {

  private val SixOverPiSq: Double = 6.0 / (math.Pi * math.Pi)

  /** Error budget for round k ≥ 1: δₖ = (6/π²)·δ/k². */
  def deltaAtRound(delta: Double, k: Int): Double = {
    require(k >= 1, s"round index must be >= 1, got $k")
    SixOverPiSq * delta / (k.toDouble * k.toDouble)
  }

  /** Mutable running intersection ⋂ₖ [Lₖ, Rₖ] (Algorithm 5 line 14). */
  final class RunningInterval {
    private var lo: Double = Double.NegativeInfinity
    private var hi: Double = Double.PositiveInfinity

    def observe(iv: Interval): Unit = {
      lo = math.max(lo, iv.lo)
      hi = math.min(hi, iv.hi)
    }

    /** Current intersection. Crossed bounds (possible only on a δ-failure
      * or from clamping artifacts) collapse to the midpoint.
      */
    def current: Interval =
      if (lo <= hi) Interval(lo, hi) else Interval((lo + hi) / 2, (lo + hi) / 2)

    def isEmptyOfObservations: Boolean = lo.isNegInfinity && hi.isPosInfinity
  }

  /** Sequential reference driver for Algorithm 5, used in tests and as the
    * specification the FastFrame engine's round logic must match: draw `B`
    * samples per round from `sampler`, recompute the (1−δₖ) interval, stop
    * when `shouldStop` fires or the sampler is exhausted.
    *
    * @return (final running interval, rounds executed, samples consumed)
    */
  def run[S](
      bounder: ErrorBounder[S],
      sampler: Iterator[Double],
      a: Double,
      b: Double,
      n: Long,
      delta: Double,
      batchSize: Int,
      shouldStop: Interval => Boolean,
      maxRounds: Int = Int.MaxValue): (Interval, Int, Long) = {
    require(batchSize > 0, "batchSize must be positive")
    val running = new RunningInterval
    var state   = bounder.init
    var k       = 0
    var taken   = 0L
    var done    = false
    while (!done && k < maxRounds && sampler.hasNext) {
      k += 1
      var i = 0
      while (i < batchSize && sampler.hasNext) {
        state = bounder.update(state, sampler.next())
        taken += 1
        i += 1
      }
      running.observe(bounder.interval(state, a, b, n, deltaAtRound(delta, k)))
      done = shouldStop(running.current)
    }
    (running.current, k, taken)
  }
}
