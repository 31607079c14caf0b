package repro.bench

/** Shared bench-scale knobs. REPRO_BENCH_SF scales the synthetic FLIGHTS
  * relation (rows = 6M · sf); the default 2.0 gives 12M rows (the paper
  * evaluates 606M — see EXPERIMENTS.md for the scale discussion).
  */
object BenchConfig {
  val sf: Double = sys.env.getOrElse("REPRO_BENCH_SF", "2.0").toDouble
  val repeats: Int = sys.env.getOrElse("REPRO_BENCH_REPEATS", "3").toInt
}
