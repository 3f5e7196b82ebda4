package repro.bench

import repro.tables.F9Modularity

class F9ModularityBench extends BenchBase {
  test("Figure 9: construction time vs best modularity") {
    val t = F9Modularity.run(spark, benchScale)
    assert(t.rows.length == 3 * (1 + F9Modularity.defaultKs.length))
    t.rows.foreach(r => assert(math.abs(r(3).toDouble) <= 1.0, s"modularity out of range: $r"))
    positiveTimes(t, 2)
    printTable(t)
  }
}
