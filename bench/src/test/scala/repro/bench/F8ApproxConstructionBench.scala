package repro.bench

import repro.tables.F8ApproxConstruction

class F8ApproxConstructionBench extends BenchBase {
  test("Figure 8: approximate index construction time vs k") {
    val t = F8ApproxConstruction.run(spark, benchScale, trials = 1)
    // 4 unweighted graphs × 2 measures + 2 weighted × 1 measure, × |ks|
    assert(t.rows.length == (4 * 2 + 2) * F8ApproxConstruction.defaultKs.length)
    positiveTimes(t, 3, 4)
    printTable(t)
  }
}
