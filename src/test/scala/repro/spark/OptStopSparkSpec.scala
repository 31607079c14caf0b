package repro.spark

import repro.SparkSpec
import repro.core.Bounders
import repro.fastframe.StopCondition
import repro.flights.FlightsData
import org.apache.spark.sql.functions._

/** Distributed optional stopping (Algorithm 5 as Spark rounds). */
class OptStopSparkSpec extends SparkSpec {

  private lazy val flights = FlightsData.df(spark, sf = 0.005).cache()
  private lazy val scr     = SparkScramble.scramble(flights, seed = 21L).cache()
  private lazy val range   = {
    val r = flights.agg(min("DepDelay"), max("DepDelay")).head
    (r.getDouble(0), r.getDouble(1))
  }

  test("HAVING-style run matches the exact partition (F-q2 semantics)") {
    val (a, b) = range
    val res = OptStopSpark.run(
      scr, "DepDelay", Seq("Airline"), Bounders.BernsteinRT, a, b,
      delta = 1e-15, stop = StopCondition.ThresholdSide(0.0), numViewsUpper = 12)
    val exact = flights.groupBy("Airline").agg(avg("DepDelay").as("m")).collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(res.groups.size === 12)
    res.groups.foreach { g =>
      val mu = exact(g.key.head)
      assert(g.iv.contains(mu) || g.exact, s"${g.key}: ${g.iv} vs $mu")
      // The side of the threshold must be decided correctly.
      if (g.iv.lo > 0) assert(mu > 0)
      if (g.iv.hi < 0) assert(mu < 0)
    }
    assert(res.finalPrefix <= flights.count())
    assert(res.rounds >= 1)
    assert(res.totalRowsRead >= res.finalPrefix)
  }

  test("relaxed delta and an easy threshold terminate before reading everything") {
    // Every airline mean is far above -5; a moderate delta lets the run
    // stop on a prefix (at 30k rows the paper's 1e-15 needs ~all of it).
    val (a, b) = range
    val res = OptStopSpark.run(
      scr, "DepDelay", Seq("Airline"), Bounders.BernsteinRT, a, b,
      delta = 0.01, stop = StopCondition.ThresholdSide(-5.0), numViewsUpper = 12,
      initialPrefix = 5000)
    assert(res.finalPrefix < flights.count())
    assert(res.groups.forall(g => g.iv.lo > -5.0 || g.exact))
  }

  test("ungrouped run converges on the global mean") {
    val (a, b) = range
    val res = OptStopSpark.run(
      scr, "DepDelay", Nil, Bounders.BernsteinRT, a, b,
      delta = 1e-6, stop = StopCondition.AbsoluteWidth(2.0), numViewsUpper = 1,
      initialPrefix = 5000)
    val mu = flights.agg(avg("DepDelay")).head.getDouble(0)
    assert(res.groups.size === 1)
    val g = res.groups.head
    assert(g.iv.contains(mu) || g.exact)
    assert(g.iv.width < 2.0 || g.exact)
  }

  test("exhausting the scramble yields exact groups") {
    val (a, b) = range
    val res = OptStopSpark.run(
      scr, "DepDelay", Seq("Airline"), Bounders.Hoeffding, a, b,
      delta = 1e-15, stop = StopCondition.AbsoluteWidth(1e-9), numViewsUpper = 12,
      initialPrefix = flights.count())
    assert(res.groups.forall(_.exact))
    assert(res.rounds === 1)
    val exact = flights.groupBy("Airline").agg(avg("DepDelay").as("m")).collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    res.groups.foreach(g => assert(math.abs(g.mean - exact(g.key.head)) < 1e-9))
  }

  test("rounds grow the prefix geometrically") {
    val (a, b) = range
    val res = OptStopSpark.run(
      scr, "DepDelay", Seq("Airline"), Bounders.Hoeffding, a, b,
      delta = 1e-15, stop = StopCondition.AbsoluteWidth(1e-9), numViewsUpper = 12,
      initialPrefix = 1000, growth = 2.0, maxRounds = 3)
    assert(res.rounds === 3)
    assert(res.finalPrefix === 4000L)
    assert(res.totalRowsRead === 1000L + 2000L + 4000L)
  }
}
