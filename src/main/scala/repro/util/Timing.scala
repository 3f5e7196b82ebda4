package repro.util

/** Wall-clock helpers for the bench harnesses. */
object Timing {

  /** Run `f` once; return (result, seconds). */
  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val r  = f
    val t1 = System.nanoTime()
    (r, (t1 - t0) / 1e9)
  }

  /** Run `f` `trials` times; return (last result, median seconds).
    *
    * The paper reports medians of five trials; benches here use fewer
    * trials (documented in EXPERIMENTS.md) to fit the session budget.
    */
  def medianTime[A](trials: Int)(f: => A): (A, Double) = {
    require(trials >= 1)
    val runs = (1 to trials).map(_ => time(f))
    (runs.last._1, runs.map(_._2).sorted.apply((trials - 1) / 2))
  }
}
