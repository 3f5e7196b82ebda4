package repro.approx

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestUtil}
import repro.core.{ScanIndex, ScanQuery, Similarity}
import repro.graph.{GraphGen, GraphOps}

class ApproxSpec extends SparkSpec {

  // --------------------------------------------------------- SimHash -----

  test("SimHash sketches are deterministic in the seed") {
    val g  = GraphGen.erdosRenyi(spark, 60, 400, seed = 1)
    val a  = ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Cosine, 64, seed = 5)
    val b  = ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Cosine, 64, seed = 5)
    TestUtil.assertSimsEqual(TestUtil.simsToMap(a), TestUtil.simsToMap(b), 0.0)
  }

  test("SimHash estimates differ across seeds") {
    val g = GraphGen.erdosRenyi(spark, 60, 400, seed = 1)
    val a = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Cosine, 32, seed = 5))
    val b = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Cosine, 32, seed = 6))
    assert(a != b)
  }

  test("SimHash sketch has k bits packed into ceil(k/64) longs") {
    val g  = GraphGen.path(spark, 4)
    val sk = SimHash.sketches(spark, GraphOps.closedAdjacency(g), 130, seed = 2)
    val rows = sk.collect()
    assert(rows.length == 4)
    rows.foreach(r => assert(r.getSeq[Long](1).length == 3))
  }

  test("SimHash estimate of identical neighborhoods is 1 (twins in K3)") {
    // In K3 all closed neighborhoods are equal → identical sketches → cos(0)=1.
    val g = GraphGen.complete(spark, 3)
    val s = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Cosine, 64, seed = 3))
    s.values.foreach(v => assert(math.abs(v - 1.0) < 1e-12))
  }

  test("Theorem 5.2: high-k SimHash classifies edges outside the eps band correctly") {
    val g   = GraphGen.denseWeighted(spark, 50, 500, seed = 4)
    val n   = GraphOps.numVertices(g).toDouble
    val m   = GraphOps.numEdges(g).toDouble
    val eps = 0.5
    val delta = 0.25
    val kMin = math.ceil(math.Pi * math.Pi * math.log(n * m) / (2 * delta * delta)).toInt
    val k = Integer.highestOneBit(kMin) * 2 // round up to a power of two
    val exact  = TestUtil.simsToMap(Similarity.similarities(g, Similarity.Cosine))
    val approx = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Cosine, k, seed = 7))
    val lo = eps - delta
    val hi = eps + math.sqrt(1 - eps * eps) * delta
    exact.foreach { case (e, s) =>
      if (s <= lo) assert(approx(e) < eps, s"edge $e: exact=$s approx=${approx(e)} should be < $eps")
      if (s >= hi) assert(approx(e) >= eps, s"edge $e: exact=$s approx=${approx(e)} should be >= $eps")
    }
  }

  // --------------------------------------------------------- MinHash -----

  test("MinHash OPH sketches are deterministic in the seed") {
    val g = GraphGen.erdosRenyi(spark, 60, 400, seed = 11)
    val a = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Jaccard, 32, seed = 5))
    val b = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Jaccard, 32, seed = 5))
    assert(a == b)
  }

  test("MinHash estimate of identical sets is 1 (twins in K4)") {
    val g = GraphGen.complete(spark, 4)
    val s = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Jaccard, 64, seed = 13))
    s.values.foreach(v => assert(v == 1.0))
  }

  test("MinHash estimates are within [0, 1]") {
    val g = GraphGen.rmat(spark, 8, 700, seed = 14)
    val s = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Jaccard, 16, seed = 15))
    s.values.foreach(v => assert(v >= 0.0 && v <= 1.0))
  }

  test("Theorem 5.3 analogue: high-k MinHash classifies edges outside eps±delta") {
    val g     = GraphGen.erdosRenyi(spark, 64, 600, seed = 16)
    val n     = GraphOps.numVertices(g).toDouble
    val m     = GraphOps.numEdges(g).toDouble
    val eps   = 0.4
    val delta = 0.22
    // Theorem 5.3 is for standard MinHash; OPH has lower variance in
    // practice (§6.3) — we allow a small failure count for the tail bound
    // not formally covering OPH.
    val k = math.max(256, math.ceil(math.log(n * m) / (2 * delta * delta)).toInt)
    val exact  = TestUtil.simsToMap(Similarity.similarities(g, Similarity.Jaccard))
    val approx = TestUtil.simsToMap(ApproxSimilarity.similaritiesNoHeuristic(g, Similarity.Jaccard, k, seed = 17))
    var bad = 0
    exact.foreach { case (e, s) =>
      if (s <= eps - delta && !(approx(e) < eps)) bad += 1
      if (s >= eps + delta && !(approx(e) >= eps)) bad += 1
    }
    assert(bad <= math.max(1, exact.size / 100), s"$bad of ${exact.size} misclassified")
  }

  // -------------------------------------------------------- heuristic ----

  test("heuristic: edges with a low-degree endpoint get exact similarities") {
    val g = GraphGen.rmat(spark, 8, 900, seed = 21)
    val k = 8
    val exact  = TestUtil.simsToMap(Similarity.similarities(g, Similarity.Cosine))
    val approx = TestUtil.simsToMap(ApproxSimilarity.similarities(g, Similarity.Cosine, k, seed = 22))
    assert(approx.keySet == exact.keySet)
    val deg = GraphOps.degrees(g).collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    exact.foreach { case ((u, v), s) =>
      if (deg(u) <= k || deg(v) <= k) {
        assert(approx((u, v)) == s, s"low-degree edge ($u,$v) not exact")
      }
    }
  }

  test("heuristic thresholds: cosine sketches only vertices with degree > k") {
    // On a star, the center has high degree but every edge touches a
    // degree-1 leaf → all edges exact, and the result matches exact sims.
    val g = GraphGen.star(spark, 30)
    val approx = TestUtil.simsToMap(ApproxSimilarity.similarities(g, Similarity.Cosine, 4, seed = 23))
    val exact  = TestUtil.simsToMap(Similarity.similarities(g, Similarity.Cosine))
    TestUtil.assertSimsEqual(approx, exact, 0.0)
  }

  test("heuristic: jaccard threshold is 3k/2") {
    val k = 4 // threshold 6
    val g = GraphGen.complete(spark, 8) // all degrees 7 > 6 → all approximated
    val approx = TestUtil.simsToMap(ApproxSimilarity.similarities(g, Similarity.Jaccard, k, seed = 24))
    // identical closed neighborhoods → estimate exactly 1 regardless of k
    approx.values.foreach(v => assert(v == 1.0))
    val g2 = GraphGen.complete(spark, 7) // all degrees 6 <= 6 → all exact
    val approx2 = TestUtil.simsToMap(ApproxSimilarity.similarities(g2, Similarity.Jaccard, k, seed = 25))
    val exact2  = TestUtil.simsToMap(Similarity.similarities(g2, Similarity.Jaccard))
    TestUtil.assertSimsEqual(approx2, exact2, 0.0)
  }

  test("approximate similarities cover every edge exactly once") {
    val g = GraphGen.denseWeighted(spark, 80, 1200, seed = 26)
    val df = ApproxSimilarity.similarities(g, Similarity.Cosine, 16, seed = 27)
    assert(df.count() == g.count())
    assert(df.groupBy("src", "dst").count().filter(col("count") > 1).count() == 0)
  }

  // ------------------------------------------------- end-to-end index ----

  test("approximate index supports clustering queries end-to-end") {
    val g   = GraphGen.denseWeighted(spark, 80, 1200, seed = 31)
    val idx = ApproxSimilarity.buildIndex(g, Similarity.Cosine, 32, seed = 32).cache()
    val clusters = ScanQuery.cluster(idx, 3, 0.5)
    // sanity: output labels reference clustered vertices only
    val cm = TestUtil.clustersToMap(clusters)
    cm.values.foreach(label => assert(cm.contains(label)))
    idx.unpersist()
  }

  test("high-k approximate clustering matches exact clustering (dense graph)") {
    val g     = GraphGen.denseWeighted(spark, 60, 900, seed = 33)
    val exact = ScanIndex.build(g, Similarity.Cosine).cache()
    // eps=0.5 away from the sim mass boundary; high k.
    val approxIdx = ApproxSimilarity.buildIndex(g, Similarity.Cosine, 2048, seed = 34).cache()
    val a = TestUtil.clustersToMap(ScanQuery.cluster(approxIdx, 3, 0.5))
    val b = TestUtil.clustersToMap(ScanQuery.cluster(exact, 3, 0.5))
    // identical modulo edges inside the eps band; demand >= 90% agreement
    val common = a.keySet.intersect(b.keySet)
    val total  = a.keySet.union(b.keySet)
    assert(total.isEmpty || common.size.toDouble / total.size >= 0.9,
      s"clustered-set agreement too low: ${common.size}/${total.size}")
    exact.unpersist(); approxIdx.unpersist()
  }

  test("approximate index neighbor order is still rank-contiguous") {
    val g   = GraphGen.denseWeighted(spark, 50, 600, seed = 35)
    val idx = ApproxSimilarity.buildIndex(g, Similarity.Cosine, 16, seed = 36)
    val bad = idx.neighborOrder
      .groupBy("v")
      .agg(min("rank").as("lo"), count(lit(1)).as("c"), max("rank").as("hi"))
      .filter(col("lo") =!= 2 || col("hi") =!= col("c") + 1)
    assert(bad.count() == 0)
  }
}
