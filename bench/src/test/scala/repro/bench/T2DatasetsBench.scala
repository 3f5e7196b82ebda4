package repro.bench

import repro.tables.{Datasets, T2Datasets}

class T2DatasetsBench extends BenchBase {
  test("Table 2: dataset summary") {
    val t = T2Datasets.run(spark, benchScale)
    assert(t.rows.length == Datasets.suite(benchScale).length)
    t.rows.foreach { r =>
      assert(r(1).toLong > 0 && r(2).toLong > 0)
    }
    printTable(t)
  }
}
