package repro.bench

import repro.SparkSpec
import repro.tables.TableResult

/** Base for the bench suites: each reproduces one paper table/figure at
  * "bench" scale, prints the rendered table (recorded in bench_output.txt
  * and EXPERIMENTS.md), and asserts only weak structural invariants —
  * the shape comparison against the paper lives in EXPERIMENTS.md, not in
  * hard assertions that would flake with machine noise.
  */
trait BenchBase extends SparkSpec {

  val benchScale: String = sys.env.getOrElse("BENCH_SCALE", "bench")

  /** Times must parse and be non-negative (sub-0.1 ms sequential queries
    * can round to 0.0000).
    */
  def positiveTimes(t: TableResult, cols: Int*): Unit =
    t.rows.foreach(r => cols.foreach(c => assert(r(c).toDouble >= 0, s"negative time: $r")))

  def printTable(t: TableResult): Unit = {
    println()
    println(t.render)
    println()
  }
}
