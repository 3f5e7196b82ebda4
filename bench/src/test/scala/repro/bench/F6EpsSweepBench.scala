package repro.bench

import repro.tables.F6EpsSweep

class F6EpsSweepBench extends BenchBase {
  test("Figure 6: query time vs eps (mu=5)") {
    val t = F6EpsSweep.run(spark, benchScale, mu = 5, trials = 1)
    assert(t.rows.length == 6 * F6EpsSweep.defaultEps.length)
    positiveTimes(t, 2, 3, 4)
    printTable(t)
  }
}
