package repro.core

/** Derived range bounds for aggregates over arbitrary expressions
  * (paper Appendix B).
  *
  * Given per-column range constraints aᵢ ≤ cᵢ ≤ bᵢ and an expression
  * f(c₁,…,cₙ), the range-based bounders need derived bounds
  * [inf f, sup f] over the box. The appendix handles two expression
  * classes, both implemented here:
  *
  *  1. f monotone in each column → each extremum is attained at a corner
  *     determined per-coordinate by the sign of f's monotonicity;
  *  2. f convex (or concave) → the convex side's extremum over a box is at
  *     one of the 2ⁿ corners (enumerated; n ≤ ~20 as the paper notes), and
  *     the other side is found by box-projected coordinate descent from
  *     multiple starts (standing in for the off-the-shelf convex solver the
  *     paper defers to).
  */
object DerivedRange {

  /** A box constraint: column i lies in [lo(i), hi(i)]. */
  final case class Box(lo: Vector[Double], hi: Vector[Double]) {
    require(lo.size == hi.size, "box bounds must have equal arity")
    require(lo.indices.forall(i => lo(i) <= hi(i)), "box must satisfy lo <= hi")
    def arity: Int = lo.size
    def center: Vector[Double] = lo.indices.map(i => (lo(i) + hi(i)) / 2).toVector
    def clamp(x: Vector[Double]): Vector[Double] =
      x.indices.map(i => math.min(hi(i), math.max(lo(i), x(i)))).toVector
  }

  /** All 2ⁿ corners of the box (n ≤ 20 guarded; the paper's own limit). */
  def corners(box: Box): Iterator[Vector[Double]] = {
    require(box.arity <= 20, s"corner enumeration limited to 20 columns, got ${box.arity}")
    Iterator.range(0, 1 << box.arity).map { mask =>
      Vector.tabulate(box.arity)(i => if ((mask & (1 << i)) != 0) box.hi(i) else box.lo(i))
    }
  }

  /** Derived [min, max] for an f declared monotone per column:
    * `increasing(i)` = true if f is nondecreasing in column i. Evaluates f
    * at the two sign-determined corners (Appendix B case 1).
    */
  def monotoneRange(f: Vector[Double] => Double, box: Box, increasing: Vector[Boolean]): Interval = {
    require(increasing.size == box.arity, "monotonicity flags must match arity")
    val atMin = Vector.tabulate(box.arity)(i => if (increasing(i)) box.lo(i) else box.hi(i))
    val atMax = Vector.tabulate(box.arity)(i => if (increasing(i)) box.hi(i) else box.lo(i))
    Interval(f(atMin), f(atMax))
  }

  /** Max of a convex f over the box: attained at a corner (Appendix B case 2). */
  def convexMax(f: Vector[Double] => Double, box: Box): Double =
    corners(box).map(f).max

  /** Min of a convex f over the box by multi-start projected coordinate
    * descent with golden-section line search per coordinate. For a convex f
    * this converges to the (box-constrained) global minimum up to `tol`.
    */
  def convexMin(f: Vector[Double] => Double, box: Box, tol: Double = 1e-9, sweeps: Int = 200): Double = {
    def goldenMin(g: Double => Double, lo0: Double, hi0: Double): Double = {
      val phi = (math.sqrt(5.0) - 1.0) / 2.0
      var lo = lo0; var hi = hi0
      var c  = hi - phi * (hi - lo); var d = lo + phi * (hi - lo)
      var fc = g(c); var fd = g(d)
      while (hi - lo > tol) {
        if (fc < fd) { hi = d; d = c; fd = fc; c = hi - phi * (hi - lo); fc = g(c) }
        else { lo = c; c = d; fc = fd; d = lo + phi * (hi - lo); fd = g(d) }
      }
      (lo + hi) / 2
    }
    val starts = Seq(box.center, box.lo, box.hi)
    starts.map { start =>
      var x    = start
      var last = f(x)
      var s    = 0
      var improved = true
      while (s < sweeps && improved) {
        for (i <- 0 until box.arity) {
          val xi = goldenMin(v => f(x.updated(i, v)), box.lo(i), box.hi(i))
          x = x.updated(i, xi)
        }
        val cur = f(x)
        improved = last - cur > tol
        last = cur
        s += 1
      }
      last
    }.min
  }

  /** Derived range for a convex f over the box (Appendix B case 2). */
  def convexRange(f: Vector[Double] => Double, box: Box): Interval =
    Interval(convexMin(f, box), convexMax(f, box))

  /** Derived range for a concave f (apply the convex machinery to −f). */
  def concaveRange(f: Vector[Double] => Double, box: Box): Interval = {
    val neg = convexRange(x => -f(x), box)
    Interval(-neg.hi, -neg.lo)
  }
}
