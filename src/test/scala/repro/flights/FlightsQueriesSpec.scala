package repro.flights

import repro.SparkSpec
import repro.core.{Bounders, Interval}
import repro.fastframe._

/** Query definitions (paper Figure 5 / Table 4) and an end-to-end smoke
  * run of the full harness at small scale: every approximate answer must
  * agree with the exact answer (the paper's "a cool 0" failures).
  */
class FlightsQueriesSpec extends SparkSpec {

  private lazy val scr = FlightsData.scramble(spark, sf = 0.005)

  test("Table-4 stopping-condition mapping") {
    assert(FlightsQueries.q1().stop === StopCondition.RelativeWidth(0.5))
    assert(FlightsQueries.q2().stop === StopCondition.ThresholdSide(0.0))
    assert(FlightsQueries.q3().stop === StopCondition.TopKSeparated(2, largest = false))
    assert(FlightsQueries.q4.stop === StopCondition.ThresholdSide(10.0))
    assert(FlightsQueries.q5.stop === StopCondition.ThresholdSide(0.0))
    assert(FlightsQueries.q6.stop === StopCondition.TopKSeparated(5, largest = true))
    assert(FlightsQueries.q7.stop === StopCondition.GroupsOrdered)
    assert(FlightsQueries.q8.stop === StopCondition.TopKSeparated(1, largest = true))
    assert(FlightsQueries.q9.stop === StopCondition.TopKSeparated(1, largest = true))
  }

  test("query filters and groupings match Figure 5") {
    assert(FlightsQueries.q1("SFO").filter === Predicate.CatEq("Origin", "SFO"))
    assert(FlightsQueries.q3(900).filter === Predicate.NumGt("DepTime", 900.0))
    assert(FlightsQueries.q6.groupBy === Seq("DayOfWeek", "Origin"))
    assert(FlightsQueries.q7.filter === Predicate.CatEq("Airline", "HP"))
    assert(FlightsQueries.q7.groupBy === Seq("DayOfWeek"))
    assert(FlightsQueries.all.map(_.name) ===
      Seq("F-q1", "F-q2", "F-q3", "F-q4", "F-q5", "F-q6", "F-q7", "F-q8", "F-q9"))
  }

  for (q <- FlightsQueries.all) {
    test(s"${q.name}: Bernstein+RT answer matches exact at sf=0.005") {
      val run = Engine.run(scr, q, EngineConfig(bounder = Bounders.BernsteinRT, roundRows = 10000))
      val ex  = Engine.runExact(scr, q)
      assert(TableHarness.isCorrect(q, run, ex), s"${q.name} wrong answer")
    }
  }

  test("F-q2 terminates before a full pass at small scale with relaxed delta") {
    // At 30k rows the paper's delta=1e-15 forces near-full scans (the
    // sample requirement does not shrink with N); a moderate delta shows
    // the early-termination machinery working end-to-end.
    val r2 = Engine.run(scr, FlightsQueries.q2(),
      EngineConfig(bounder = Bounders.BernsteinRT, delta = 0.01, roundRows = 5000))
    val ex = Engine.runExact(scr, FlightsQueries.q2())
    assert(r2.metrics.blocksFetched < scr.numBlocks)
    assert(TableHarness.isCorrect(FlightsQueries.q2(), r2, ex))
  }

  test("isCorrect detects a wrong HAVING partition") {
    val q  = FlightsQueries.q5
    val ex = Engine.runExact(scr, q)
    // Forge a run claiming every airport is above 0.
    val forged = ex.copy(results = ex.results.map(r =>
      r.copy(bounds = r.bounds.copy(mean = 5.0, iv = Interval(1.0, 9.0), exact = false))))
    assert(!TableHarness.isCorrect(q, forged, ex))
  }

  test("isCorrect detects a wrong top-k") {
    val q  = FlightsQueries.q9
    val ex = Engine.runExact(scr, q)
    val worstKey = ex.topK(1, largest = false).head
    val forged = ex.copy(results = ex.results.map { r =>
      val mean = if (r.key == worstKey) 99.0 else 0.0
      r.copy(bounds = r.bounds.copy(mean = mean, iv = Interval(mean, mean)))
    })
    assert(!TableHarness.isCorrect(q, forged, ex))
  }

  test("evaluate() aggregates repeats and flags correctness") {
    val row = TableHarness.evaluate(scr, FlightsQueries.q2(),
      Seq("B+RT" -> EngineConfig(bounder = Bounders.BernsteinRT, roundRows = 10000)), repeats = 2)
    assert(row.query === "F-q2")
    assert(row.evals.size === 1)
    assert(row.evals.head.allCorrect)
    assert(row.evals.head.speedupBlocks > 0)
    assert(row.exactBlocks === scr.numBlocks) // unfiltered query scans all blocks
  }

  test("render() produces a row per query") {
    val rows = Seq(TableHarness.evaluate(scr, FlightsQueries.q2(),
      Seq("B+RT" -> EngineConfig(bounder = Bounders.BernsteinRT, roundRows = 10000)), repeats = 1))
    val out = TableHarness.render(rows, "Exact")
    assert(out.contains("F-q2"))
    assert(out.contains("B+RT"))
  }
}
