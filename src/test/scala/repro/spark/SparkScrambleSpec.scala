package repro.spark

import repro.{SparkSpec, SynthData}
import org.apache.spark.sql.functions._

/** DataFrame-level scramble: permutation + contiguous positions. */
class SparkScrambleSpec extends SparkSpec {

  private lazy val base = SynthData.customer(spark, sf = 0.02).cache()
  private lazy val scr  = SparkScramble.scramble(base, seed = 11L).cache()

  test("scramble preserves the row multiset") {
    assert(scr.count() === base.count())
    assert(scr.agg(sum("c_custkey")).head.getLong(0) === base.agg(sum("c_custkey")).head.getLong(0))
  }

  test("positions are exactly 0 .. N-1") {
    val n = scr.count()
    val agg = scr.agg(min(SparkScramble.PosCol), max(SparkScramble.PosCol),
      countDistinct(SparkScramble.PosCol)).head
    assert(agg.getLong(0) === 0L)
    assert(agg.getLong(1) === n - 1)
    assert(agg.getLong(2) === n)
  }

  test("prefix takes exactly r distinct rows (without replacement)") {
    val p = SparkScramble.prefix(scr, 500)
    assert(p.count() === 500L)
    assert(p.select("c_custkey").distinct().count() === 500L)
  }

  test("prefixes are nested: larger prefixes contain smaller ones") {
    val small = SparkScramble.prefix(scr, 200).select("c_custkey").collect().map(_.getLong(0)).toSet
    val large = SparkScramble.prefix(scr, 400).select("c_custkey").collect().map(_.getLong(0)).toSet
    assert(small.subsetOf(large))
  }

  test("the permutation is not the identity and differs across seeds") {
    val firstKeys =
      scr.filter(col(SparkScramble.PosCol) < 100).orderBy(SparkScramble.PosCol)
        .select("c_custkey").collect().map(_.getLong(0)).toSeq
    assert(firstKeys !== (1L to 100L))
    val other = SparkScramble.scramble(base, seed = 12L)
    val otherKeys =
      other.filter(col(SparkScramble.PosCol) < 100).orderBy(SparkScramble.PosCol)
        .select("c_custkey").collect().map(_.getLong(0)).toSeq
    assert(firstKeys !== otherKeys)
  }

  test("a prefix is an unbiased sample: mean close to population mean") {
    val popMean = base.agg(avg("c_acctbal")).head.getDouble(0)
    val sampleMean = SparkScramble.prefix(scr, 1000).agg(avg("c_acctbal")).head.getDouble(0)
    // acctbal ~ U(-1000, 9000): se of 1000-sample mean ~ 91; allow 5 se.
    assert(math.abs(sampleMean - popMean) < 460)
  }
}
