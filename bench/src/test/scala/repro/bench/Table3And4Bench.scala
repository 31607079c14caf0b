package repro.bench

import repro.SparkSpec
import repro.flights.{FlightsData, FlightsQueries}
import org.apache.spark.sql.functions._

/** Reproduces paper Table 3 (dataset description) for the synthetic
  * FLIGHTS substitute, and prints the Table 4 query ↔ stopping-condition
  * summary from the query definitions themselves.
  */
class Table3And4Bench extends SparkSpec {

  test("Table 3: dataset description") {
    val df = FlightsData.df(spark, sf = BenchConfig.sf).cache()
    val n  = df.count()
    val stats = df.agg(
      min("DepDelay"), max("DepDelay"), countDistinct("Origin"), countDistinct("Airline")).head
    val approxBytes = n * (4L + 4 + 8 + 4 + 4) // origin, airline, delay, deptime, dow

    println("== Table 3 reproduction: dataset description ==")
    println(f"${"Dataset"}%-10s ${"Size"}%10s ${"#Tuples"}%12s ${"#Attributes"}%12s ${"Replications"}%13s")
    println(f"${"FLIGHTS*"}%-10s ${f"${approxBytes / 1024.0 / 1024.0}%.0f MiB"}%10s $n%12d ${5}%12d ${"1x (synthetic)"}%13s")
    println(f"${"(paper)"}%-10s ${"32 GiB"}%10s ${"606M"}%12s ${5}%12d ${"5x"}%13s")
    println(f"DepDelay range: [${stats.getDouble(0)}%.1f, ${stats.getDouble(1)}%.1f]")

    assert(n === (FlightsData.RowsPerSf * BenchConfig.sf).toLong)
    assert(stats.getLong(2) === 60L) // airports present
    assert(stats.getLong(3) === 12L) // airlines present
    assert(stats.getDouble(0) >= FlightsData.DelayFloor)
    assert(stats.getDouble(1) > 60.0) // outliers widen the catalog range
    df.unpersist()
  }

  test("Table 4: query / stopping-condition summary") {
    println("== Table 4 reproduction: queries and stopping conditions ==")
    println(f"${"Query"}%-6s ${"Stop When"}%-42s ${"Filter"}%-34s ${"Group By"}%-20s")
    FlightsQueries.all.foreach { q =>
      println(f"${q.name}%-6s ${q.stop.toString}%-42s ${q.filter.toString}%-34s ${q.groupBy.mkString(",")}%-20s")
    }
    assert(FlightsQueries.all.size === 9)
    // Conditions 3, 4, 5, 6 are all exercised (1 and 2 behave like 3, as
    // the paper notes in §5.1).
    val kinds = FlightsQueries.all.map(_.stop.getClass.getSimpleName).toSet
    assert(kinds.exists(_.startsWith("RelativeWidth")))
    assert(kinds.exists(_.startsWith("ThresholdSide")))
    assert(kinds.exists(_.startsWith("TopKSeparated")))
    assert(kinds.exists(_.startsWith("GroupsOrdered")))
  }
}
