package repro.bench

import repro.tables.F7MuSweep

class F7MuSweepBench extends BenchBase {
  test("Figure 7: query time vs mu (eps=0.6)") {
    val t = F7MuSweep.run(spark, benchScale, eps = 0.6, trials = 1)
    assert(t.rows.nonEmpty)
    positiveTimes(t, 2, 3, 4)
    printTable(t)
  }
}
