package repro.bench

import repro.tables.{F9Modularity, F10Ari}

class F10AriBench extends BenchBase {
  test("Figure 10: ARI of approximate clustering vs exact") {
    val t = F10Ari.run(spark, benchScale)
    assert(t.rows.length == 3 * F9Modularity.defaultKs.length)
    t.rows.foreach(r => assert(r(4).toDouble >= -1.0 && r(4).toDouble <= 1.0))
    positiveTimes(t, 3)
    printTable(t)
  }
}
