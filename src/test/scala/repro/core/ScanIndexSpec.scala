package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestUtil}
import repro.graph.{GraphGen, GraphOps}

class ScanIndexSpec extends SparkSpec {

  private lazy val g     = GraphGen.rmat(spark, 9, 2000, seed = 61).cache()
  private lazy val index = ScanIndex.build(g, Similarity.Cosine).cache()

  test("neighbor order ranks are contiguous 2..deg+1 per vertex") {
    val bad = index.neighborOrder
      .groupBy("v")
      .agg(min("rank").as("lo"), max("rank").as("hi"), count(lit(1)).as("c"))
      .join(index.degrees, Seq("v"))
      .filter(col("lo") =!= 2 || col("hi") =!= col("deg") + 1 || col("c") =!= col("deg"))
    assert(bad.count() == 0)
  }

  test("neighbor order sims are non-increasing in rank") {
    val no = index.neighborOrder
    val bad = no.as("a")
      .join(no.as("b"), col("a.v") === col("b.v") && col("a.rank") + 1 === col("b.rank"))
      .filter(col("a.sim") < col("b.sim"))
    assert(bad.count() == 0)
  }

  test("neighbor order ties broken by ascending neighbor id") {
    val no = index.neighborOrder
    val bad = no.as("a")
      .join(no.as("b"), col("a.v") === col("b.v") && col("a.rank") + 1 === col("b.rank"))
      .filter(col("a.sim") === col("b.sim") && col("a.nbr") > col("b.nbr"))
    assert(bad.count() == 0)
  }

  test("neighbor order contains each symmetric edge exactly once") {
    assert(index.neighborOrder.count() == 2 * g.count())
    val dup = index.neighborOrder.groupBy("v", "nbr").count().filter(col("count") > 1)
    assert(dup.count() == 0)
  }

  test("core order has one row per (vertex, mu) with |N̄(v)| >= mu") {
    // Row count = Σ_v deg(v) (mu ranges 2..deg+1).
    val expected = index.degrees.agg(sum("deg")).collect()(0).getLong(0)
    assert(index.coreOrder.count() == expected)
  }

  test("core order thresholds equal the NO sim at rank = mu") {
    val joined = index.coreOrder
      .join(
        index.neighborOrder.select(col("v"), col("rank").as("mu"), col("sim")),
        Seq("v", "mu"))
      .filter(col("threshold") =!= col("sim"))
    assert(joined.count() == 0)
  }

  test("core order is sorted by descending threshold within each mu") {
    val co = index.coreOrder
    val bad = co.as("a")
      .join(co.as("b"), col("a.mu") === col("b.mu") && col("a.coreRank") + 1 === col("b.coreRank"))
      .filter(col("a.threshold") < col("b.threshold"))
    assert(bad.count() == 0)
  }

  test("core thresholds are non-increasing in mu for a fixed vertex") {
    val co = index.coreOrder
    val bad = co.as("a")
      .join(co.as("b"), col("a.v") === col("b.v") && col("a.mu") + 1 === col("b.mu"))
      .filter(col("a.threshold") < col("b.threshold"))
    assert(bad.count() == 0)
  }

  test("maxMu equals the maximum closed degree") {
    val maxDeg = index.degrees.agg(max("deg")).collect()(0).getLong(0)
    assert(index.maxMu == maxDeg + 1)
  }

  test("fromSimilarities preserves the similarity values") {
    val sims = Similarity.similarities(g, Similarity.Cosine)
    val idx2 = ScanIndex.fromSimilarities(g, sims)
    TestUtil.assertSimsEqual(
      TestUtil.simsToMap(idx2.similarities),
      TestUtil.simsToMap(index.similarities),
      0.0)
  }

  test("index on the figureLike graph: core thresholds for vertex 0") {
    val idx = ScanIndex.build(GraphGen.figureLike(spark), Similarity.Cosine)
    // NO[0] (closed): rank1=self, then 1,2,3 (sim .894), then 8 (.447).
    val t = idx.coreOrder
      .filter(col("v") === 0)
      .collect()
      .map(r => r.getAs[Int]("mu") -> r.getAs[Double]("threshold"))
      .toMap
    assert(math.abs(t(2) - 4.0 / math.sqrt(20.0)) < 1e-12)
    assert(math.abs(t(4) - 4.0 / math.sqrt(20.0)) < 1e-12)
    assert(math.abs(t(5) - 2.0 / math.sqrt(20.0)) < 1e-12)
    assert(!t.contains(6))
  }

  for ((mu, eps) <- Seq((2, 0.3), (3, 0.5), (5, 0.6), (4, 0.8))) {
    test(s"cores from the index match the DuckDB oracle at (mu=$mu, eps=$eps)") {
      Oracle.assertEquivalent(
        ScanQuery.cores(index, mu, eps).select("v"),
        TestUtil.coresSql(mu, eps),
        "sims" -> index.similarities)
    }
  }

  test("cores with mu greater than maxMu is empty") {
    assert(ScanQuery.cores(index, index.maxMu + 1, 0.0).count() == 0)
  }

  test("cores at eps=0 and mu=2 is every vertex with a neighbor") {
    val idx = ScanIndex.build(GraphGen.path(spark, 6), Similarity.Cosine)
    assert(TestUtil.vertexSet(ScanQuery.cores(idx, 2, 0.0)) == (0L to 5L).toSet)
  }
}
