package repro.bench

import repro.tables.F5Construction

class F5ConstructionBench extends BenchBase {
  test("Figure 5: exact index construction times") {
    val t = F5Construction.run(spark, benchScale, trials = 2)
    assert(t.rows.length == 6)
    positiveTimes(t, 1, 2, 3)
    printTable(t)
  }
}
