package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{Bounders, Pathologies}
import repro.flights.{FlightsData, FlightsQueries, TableHarness}

/** Shared session bootstrap for the spark-submit entrypoints. */
private[jobs] object JobSession {
  def apply(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def sf: Double = sys.env.getOrElse("REPRO_SF", "0.1").toDouble
}

/** Reproduces paper Table 2: pathology matrix (PMA / PHOS) per bounder. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    println(f"${"Error Bounder"}%-16s ${"PMA"}%5s ${"PHOS"}%5s")
    def row[S](b: repro.core.ErrorBounder[S]): Unit =
      println(f"${b.name}%-16s ${if (Pathologies.exhibitsPMA(b)) "yes" else "no"}%5s " +
        f"${if (Pathologies.exhibitsPHOS(b)) "yes" else "no"}%5s")
    Bounders.all.foreach(row(_))
    row(repro.core.AndersonDkw)
  }
}

/** Reproduces paper Table 3: dataset description (our synthetic FLIGHTS). */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession("table3")
    val df    = FlightsData.df(spark, JobSession.sf)
    val n     = df.count()
    println(f"Dataset: FLIGHTS (synthetic)  #Tuples: $n%d  #Attributes: 5  " +
      f"(paper: 606M tuples, 32 GiB, 5 attrs, 5x replication)")
    spark.stop()
  }
}

/** Reproduces paper Table 5: query speedups per error bounder. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession("table5")
    val scr   = FlightsData.scramble(spark, JobSession.sf)
    val rows  = TableHarness.table5(scr)
    println(TableHarness.render(rows, "Exact"))
    spark.stop()
  }
}

/** Reproduces paper Table 6: query speedups per sampling strategy. */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession("table6")
    val scr   = FlightsData.scramble(spark, JobSession.sf)
    val rows  = TableHarness.table6(scr)
    println(TableHarness.render(rows, "Exact"))
    spark.stop()
  }
}

/** Prints paper Table 4: query ↔ stopping-condition summary. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    FlightsQueries.all.foreach { q =>
      println(f"${q.name}%-6s stop=${q.stop}%-40s filter=${q.filter}%-30s groupBy=${q.groupBy.mkString(",")}")
    }
  }
}
