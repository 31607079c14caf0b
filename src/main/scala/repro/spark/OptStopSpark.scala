package repro.spark

import org.apache.spark.sql.{DataFrame, functions => F}

import repro.core.{CountBound, Interval, MomentBounder, MomentState, OptStop}
import repro.fastframe.{GroupBounds, StopCondition}

import scala.collection.mutable

/** One group's outcome from [[OptStopSpark.run]]. */
final case class SparkGroupCi(
    key: Seq[String], m: Long, mean: Double, iv: Interval, exact: Boolean)

/** Outcome of an optional-stopping Spark run. `finalPrefix` is the data
  * the answer needed (the paper's early-termination metric);
  * `totalRowsRead` additionally counts the re-reads of each growing
  * prefix (our rounds re-aggregate from scratch rather than maintaining
  * incremental state across executors).
  */
final case class OptStopSparkResult(
    groups: IndexedSeq[SparkGroupCi],
    finalPrefix: Long,
    totalRowsRead: Long,
    rounds: Int)

/** The paper's Algorithm 5 rendered as distributed dataflow: each round
  * aggregates a growing scramble prefix with the [[MomentAggregator]]
  * (one Spark group-by over sampled partitions), then the driver computes
  * range-trimmed per-group CIs with the round-decayed error budget
  * δₖ = (6/π²)·δ/k², the Theorem-3 online N⁺, and the running
  * intersection — stopping as soon as the stopping condition holds.
  */
object OptStopSpark {

  def run(
      scrambled: DataFrame,
      valueCol: String,
      groupCols: Seq[String],
      bounder: MomentBounder,
      a: Double,
      b: Double,
      delta: Double,
      stop: StopCondition,
      numViewsUpper: Int,
      initialPrefix: Long = 40000L,
      growth: Double = 2.0,
      maxRounds: Int = 64): OptStopSparkResult = {
    require(numViewsUpper >= 1, "numViewsUpper must be >= 1")
    require(growth > 1.0, "growth must exceed 1")

    val totalRows    = scrambled.count()
    val deltaPerView = delta / numViewsUpper

    // Stable gid assignment across rounds (first-seen order).
    val gidOf  = mutable.LinkedHashMap.empty[Seq[String], Int]
    val best   = mutable.Map.empty[Int, Interval]
    var latest = Map.empty[Int, (MomentState, Long)] // gid -> (state, r at last update)

    var r       = math.min(initialPrefix, totalRows)
    var rounds  = 0
    var rowsRead = 0L
    var done    = false

    while (!done && rounds < maxRounds) {
      rounds += 1
      rowsRead += r
      val deltaK = OptStop.deltaAtRound(deltaPerView, rounds)
      val exactPass = r >= totalRows

      val aggCol = CiAggregates.momentUdaf(F.col(valueCol)).as("state")
      val prefix = SparkScramble.prefix(scrambled, r)
      val grouped =
        if (groupCols.isEmpty) prefix.agg(aggCol)
        else prefix.groupBy(groupCols.map(F.col): _*).agg(aggCol)

      val states: Seq[(Seq[String], MomentState)] = grouped.collect().toSeq.map { row =>
        val key = groupCols.indices.map(i => Option(row.get(i)).map(_.toString).getOrElse("∅"))
        val st  = row.getStruct(groupCols.length)
        (key, MomentState(st.getLong(0), st.getDouble(1), st.getDouble(2),
          st.getDouble(3), st.getDouble(4)))
      }

      latest = states.map { case (key, st) =>
        val gid = gidOf.getOrElseUpdate(key, gidOf.size)
        gid -> ((st, r))
      }.toMap

      val bounds: IndexedSeq[GroupBounds] = latest.toIndexedSeq.map { case (gid, (st, rr)) =>
        val iv =
          if (exactPass) Interval(st.mean, st.mean)
          else {
            val nPlus = CountBound.nUpper(st.m, rr, totalRows, deltaK, CountBound.DefaultAlpha)
            val raw   = bounder.interval(st, a, b, nPlus, CountBound.DefaultAlpha * deltaK)
            val prev  = best.getOrElse(gid, Interval(a, b))
            val inter = prev.intersect(raw)
            if (inter.lo <= inter.hi) inter else Interval(inter.midpoint, inter.midpoint)
          }
        best(gid) = iv
        GroupBounds(gid, st.m, st.mean, iv, exact = exactPass)
      }

      done = exactPass || stop.satisfied(bounds)
      if (!done && rounds < maxRounds) r = math.min(totalRows, math.ceil(r * growth).toLong)
    }

    val keyOfGid = gidOf.map(_.swap)
    val groups = latest.toIndexedSeq
      .sortBy(_._1)
      .map { case (gid, (st, rr)) =>
        SparkGroupCi(keyOfGid(gid), st.m, st.mean,
          best.getOrElse(gid, Interval(a, b)), exact = rr >= totalRows)
      }

    OptStopSparkResult(groups, finalPrefix = r, totalRowsRead = rowsRead, rounds = rounds)
  }
}
