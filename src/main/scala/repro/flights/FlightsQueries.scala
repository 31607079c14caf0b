package repro.flights

import repro.fastframe.{FrameQuery, Predicate, StopCondition}
import Predicate._
import StopCondition._

/** The nine FLIGHTS queries of paper Figure 5, with the stopping
  * conditions of paper Table 4. Template parameters default to the values
  * used in Table 5 (F-q1[$airport='ORD', ε=.5], F-q2[$thresh=0],
  * F-q3[$min_dep_time=10:50pm]). DepTime thresholds are minutes after
  * midnight: 1:50pm = 830, 10:50pm = 1370.
  */
object FlightsQueries {

  /** F-q1: AVG delay for one airport; stop at relative accuracy ε (❸). */
  def q1(airport: String = "ORD", eps: Double = 0.5): FrameQuery =
    FrameQuery("F-q1", "DepDelay", CatEq("Origin", airport), Nil, RelativeWidth(eps))

  /** F-q2: airlines with AVG delay above a threshold (HAVING >, ❹). */
  def q2(thresh: Double = 0.0): FrameQuery =
    FrameQuery("F-q2", "DepDelay", True, Seq("Airline"), ThresholdSide(thresh))

  /** F-q3: 2 airlines with minimum AVG delay after a departure time
    * (bottom-2 separated, ❺).
    */
  def q3(minDepTime: Double = 1370.0): FrameQuery =
    FrameQuery("F-q3", "DepDelay", NumGt("DepTime", minDepTime), Seq("Airline"),
      TopKSeparated(2, largest = false))

  /** F-q4: whether ORD has AVG delay > 10 (❹ with v = 10). */
  def q4: FrameQuery =
    FrameQuery("F-q4", "DepDelay", CatEq("Origin", "ORD"), Nil, ThresholdSide(10.0))

  /** F-q5: airports with negative AVG departure delay (HAVING <, ❹ v=0). */
  def q5: FrameQuery =
    FrameQuery("F-q5", "DepDelay", True, Seq("Origin"), ThresholdSide(0.0))

  /** F-q6: 5 worst (DayOfWeek, Origin) pairs for afternoon delays
    * (top-5 separated, ❺).
    */
  def q6: FrameQuery =
    FrameQuery("F-q6", "DepDelay", NumGt("DepTime", 830.0), Seq("DayOfWeek", "Origin"),
      TopKSeparated(5, largest = true))

  /** F-q7: AVG delay by day of week for airline HP (groups ordered, ❻). */
  def q7: FrameQuery =
    FrameQuery("F-q7", "DepDelay", CatEq("Airline", "HP"), Seq("DayOfWeek"), GroupsOrdered)

  /** F-q8: origin airport with highest AVG delay (top-1 separated, ❺). */
  def q8: FrameQuery =
    FrameQuery("F-q8", "DepDelay", True, Seq("Origin"), TopKSeparated(1, largest = true))

  /** F-q9: airline with maximum AVG delay (top-1 separated, ❺). */
  def q9: FrameQuery =
    FrameQuery("F-q9", "DepDelay", True, Seq("Airline"), TopKSeparated(1, largest = true))

  /** All nine queries at their Table-5 parameter settings. */
  def all: Seq[FrameQuery] = Seq(q1(), q2(), q3(), q4, q5, q6, q7, q8, q9)
}
