package repro.fastframe

/** Row-level predicates supported by FastFrame queries. Categorical
  * equality predicates additionally admit block-level bitmap pruning
  * (a block with no matching tuple can be skipped by every strategy,
  * including Scan and Exact — paper §5.2, "Scan … may leverage bitmaps
  * for evaluation of whether a block contains tuples that satisfy a fixed
  * predicate").
  */
sealed trait Predicate

object Predicate {
  /** No filter: every row is in the view. */
  case object True extends Predicate

  /** Categorical equality, e.g. Origin = 'ORD'. Bitmap-prunable. */
  final case class CatEq(col: String, value: String) extends Predicate

  /** Numeric strictly-greater filter, e.g. DepTime > 13:50. Row-level only. */
  final case class NumGt(col: String, threshold: Double) extends Predicate

  /** Conjunction. */
  final case class And(ps: Seq[Predicate]) extends Predicate

  private def flatten(p: Predicate): Seq[Predicate] = p match {
    case And(ps) => ps.flatMap(flatten)
    case True    => Seq.empty
    case other   => Seq(other)
  }

  /** Predicate compiled against a scramble: a per-row test plus an
    * optional block-level prune test derived from CatEq conjuncts.
    */
  final class Compiled(scramble: Scramble, p: Predicate) {
    private val conjuncts = flatten(p)

    private val catTests: Array[(Array[Int], Int)] = conjuncts.collect {
      case CatEq(col, value) =>
        val c = scramble.store.cat(col)
        (c.codes, c.codeOf(value))
    }.toArray

    private val numTests: Array[(Array[Double], Double)] = conjuncts.collect {
      case NumGt(col, t) => (scramble.store.num(col).values, t)
    }.toArray

    /** (bitmap, code) pairs for block-level pruning. */
    private val blockPrunes: Array[(BlockBitmap, Int)] = conjuncts.collect {
      case CatEq(col, value) => (scramble.bitmap(col), scramble.store.cat(col).codeOf(value))
    }.toArray

    def rowPasses(row: Int): Boolean = {
      var i = 0
      while (i < catTests.length) {
        if (catTests(i)._1(row) != catTests(i)._2) return false
        i += 1
      }
      i = 0
      while (i < numTests.length) {
        if (!(numTests(i)._1(row) > numTests(i)._2)) return false
        i += 1
      }
      true
    }

    /** May block `blk` contain any matching row? (False ⇒ certainly not.) */
    def blockMayMatch(blk: Int): Boolean = {
      var i = 0
      while (i < blockPrunes.length) {
        if (!blockPrunes(i)._1.contains(blockPrunes(i)._2, blk)) return false
        i += 1
      }
      true
    }

    def hasBlockPrunes: Boolean = blockPrunes.nonEmpty
  }

  def compile(scramble: Scramble, p: Predicate): Compiled = new Compiled(scramble, p)
}
