package repro.core

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec, TestUtil}
import repro.baseline.{SeqGraph, SeqScan}
import repro.connectivity.Connectivity
import repro.graph.GraphGen

class ScanQuerySpec extends SparkSpec {

  private lazy val fig    = GraphGen.figureLike(spark).cache()
  private lazy val figIdx = ScanIndex.build(fig, Similarity.Cosine).cache()

  // ---------------------------------------------------- hand-verified ----

  test("figureLike at (mu=3, eps=0.8): two K4 clusters") {
    val clusters = TestUtil.clustersToMap(ScanQuery.cluster(figIdx, 3, 0.8))
    assert(clusters == Map(
      0L -> 0L, 1L -> 0L, 2L -> 0L, 3L -> 0L,
      4L -> 4L, 5L -> 4L, 6L -> 4L, 7L -> 4L))
  }

  test("figureLike at (mu=3, eps=0.8): vertex 8 is a hub, 9 an outlier") {
    val clusters = ScanQuery.cluster(figIdx, 3, 0.8)
    val roles    = TestUtil.rolesToMap(ScanQuery.hubsAndOutliers(fig, clusters))
    assert(roles == Map(8L -> "hub", 9L -> "outlier"))
  }

  test("figureLike at (mu=2, eps=0.44): everything merges into one cluster") {
    // eps below σ(0,8)=σ(4,8)=.447 and σ(8,9)=.707 → 8 and 9 join.
    val clusters = TestUtil.clustersToMap(ScanQuery.cluster(figIdx, 2, 0.44))
    assert(clusters.keySet == (0L to 9L).toSet)
    assert(clusters.values.toSet.size == 1)
  }

  test("figureLike at (mu=5, eps=0.85): only the K4 interiors stay clustered") {
    // Cores need 5 eps-similar closed neighbors; only vertices 1,2,3 (and
    // 5,6,7) have |N̄|=4 < 5 — no vertex qualifies → empty clustering.
    val clusters = TestUtil.clustersToMap(ScanQuery.cluster(figIdx, 5, 0.85))
    assert(clusters.isEmpty)
  }

  test("figureLike at (mu=4, eps=0.85): K4 interiors cluster, 0 and 4 join as borders") {
    // Cores: 1,2,3 (σ=1 between interiors, .894 to 0 — eps .85: 1,2,3 have
    // N_eps = {self,0?no(.894>=.85 yes)...}; check: σ(1,0)=.894 ≥ .85 so
    // N_eps(1) = {1,0,2,3} size 4 ≥ 4 → 1,2,3 cores. 0: σ(0,1..3)=.894,
    // σ(0,8)=.447 → N_eps(0)={0,1,2,3} size 4 → 0 is a core too.
    val clusters = TestUtil.clustersToMap(ScanQuery.cluster(figIdx, 4, 0.85))
    assert(clusters == Map(
      0L -> 0L, 1L -> 0L, 2L -> 0L, 3L -> 0L,
      4L -> 4L, 5L -> 4L, 6L -> 4L, 7L -> 4L))
  }

  test("path graph at (mu=2, eps=0.5): one chain cluster") {
    val idx = ScanIndex.build(GraphGen.path(spark, 5), Similarity.Cosine)
    val clusters = TestUtil.clustersToMap(ScanQuery.cluster(idx, 2, 0.5))
    assert(clusters.keySet == (0L to 4L).toSet)
    assert(clusters.values.toSet == Set(0L))
  }

  test("two disjoint cliques produce two clusters") {
    val g = GraphGen.fromEdges(spark,
      Seq((0L, 1L), (0L, 2L), (1L, 2L), (10L, 11L), (10L, 12L), (11L, 12L)))
    val idx = ScanIndex.build(g, Similarity.Cosine)
    val clusters = TestUtil.clustersToMap(ScanQuery.cluster(idx, 2, 0.9))
    assert(clusters == Map(0L -> 0L, 1L -> 0L, 2L -> 0L, 10L -> 10L, 11L -> 10L, 12L -> 10L))
  }

  test("isolated core forms a singleton cluster") {
    // Star: at (mu=2, eps above spoke sims) no vertex has an eps-similar
    // neighbor → no cores → empty clustering.
    val idx = ScanIndex.build(GraphGen.star(spark, 6), Similarity.Cosine)
    assert(TestUtil.clustersToMap(ScanQuery.cluster(idx, 2, 0.99)).isEmpty)
    // At eps below spoke sims the whole star is one cluster.
    val all = TestUtil.clustersToMap(ScanQuery.cluster(idx, 2, 0.1))
    assert(all.keySet == (0L to 5L).toSet)
  }

  test("mu below 2 is rejected") {
    intercept[IllegalArgumentException](ScanQuery.cluster(figIdx, 1, 0.5))
  }

  // --------------------------------- equivalence vs sequential SCAN ------

  private def checkAgainstSeqScan(
      name: String,
      g: DataFrame,
      weighted: Boolean,
      params: Seq[(Int, Double)]): Unit = {
    lazy val idx = ScanIndex.build(g, Similarity.Cosine).cache()
    lazy val sg  = SeqGraph.fromDataFrame(g)
    for ((mu, eps) <- params) {
      test(s"index query equals sequential SCAN on $name at (mu=$mu, eps=$eps)") {
        val ours = TestUtil.clustersToMap(ScanQuery.cluster(idx, mu, eps))
        val ref =
          if (!weighted) SeqScan.cluster(sg, Similarity.Cosine, mu, eps)
          else {
            // Weighted sims: feed Spark-computed values into the reference
            // so FP summation order cannot flip >= eps at the boundary.
            val sims = TestUtil.simsToMap(idx.similarities)
            SeqScan.clusterWithSims(
              sg,
              (u, v) => sims((math.min(sg.ids(u), sg.ids(v)), math.max(sg.ids(u), sg.ids(v)))),
              mu,
              eps)
          }
        assert(ours == ref, {
          val onlyOurs = ours.toSet -- ref.toSet
          val onlyRef  = ref.toSet -- ours.toSet
          s"mismatch: onlyOurs=${onlyOurs.take(5)} onlyRef=${onlyRef.take(5)}"
        })
      }
    }
  }

  private val grid = Seq(
    (2, 0.2), (2, 0.5), (2, 0.8),
    (3, 0.3), (3, 0.6),
    (5, 0.4), (5, 0.7),
    (8, 0.5), (16, 0.6))

  checkAgainstSeqScan("figureLike", GraphGen.figureLike(spark), weighted = false, grid)
  checkAgainstSeqScan("rmat-10", GraphGen.rmat(spark, 10, 3000, seed = 71), weighted = false, grid)
  checkAgainstSeqScan("er-200", GraphGen.erdosRenyi(spark, 200, 1400, seed = 72), weighted = false, grid)
  checkAgainstSeqScan("dense-weighted-80", GraphGen.denseWeighted(spark, 80, 1000, seed = 73), weighted = true, grid)
  checkAgainstSeqScan("planted-90", GraphGen.plantedPartition(spark, 90, 3, 0.5, 0.02, seed = 74), weighted = false, grid)

  test("index query with DataFrame connectivity equals GraphX connectivity") {
    val g   = GraphGen.rmat(spark, 9, 2500, seed = 75)
    val idx = ScanIndex.build(g, Similarity.Cosine).cache()
    for ((mu, eps) <- Seq((2, 0.4), (3, 0.6), (5, 0.5))) {
      val a = TestUtil.clustersToMap(
        ScanQuery.cluster(idx, mu, eps, Connectivity.connectedComponentsGraphX))
      val b = TestUtil.clustersToMap(
        ScanQuery.cluster(idx, mu, eps, Connectivity.connectedComponentsDataFrame(_, _, _)))
      assert(a == b)
    }
    idx.unpersist()
  }

  // ----------------------------------- hubs/outliers against the oracle --

  for ((mu, eps) <- Seq((2, 0.5), (3, 0.6), (3, 0.8), (5, 0.5))) {
    test(s"hubs/outliers match the DuckDB oracle on rmat at (mu=$mu, eps=$eps)") {
      val g        = GraphGen.rmat(spark, 9, 1800, seed = 76)
      val idx      = ScanIndex.build(g, Similarity.Cosine)
      val clusters = ScanQuery.cluster(idx, mu, eps).cache()
      Oracle.assertEquivalent(
        ScanQuery.hubsAndOutliers(g, clusters).select("v", "role"),
        TestUtil.hubsOutliersSql,
        "edges" -> g,
        "clusters" -> clusters)
      clusters.unpersist()
    }
  }

  test("hubs/outliers partition the unclustered vertices") {
    val g        = GraphGen.rmat(spark, 9, 1500, seed = 77)
    val idx      = ScanIndex.build(g, Similarity.Cosine)
    val clusters = ScanQuery.cluster(idx, 3, 0.6).cache()
    val roles    = ScanQuery.hubsAndOutliers(g, clusters)
    val nClustered   = clusters.count()
    val nUnclustered = roles.count()
    assert(nClustered + nUnclustered == repro.graph.GraphOps.numVertices(g))
    clusters.unpersist()
  }

  test("clustered vertices never appear in hubsAndOutliers") {
    val clusters = ScanQuery.cluster(figIdx, 3, 0.8).cache()
    val roles    = ScanQuery.hubsAndOutliers(fig, clusters)
    val overlap  = roles.join(clusters, Seq("v")).count()
    assert(overlap == 0)
    clusters.unpersist()
  }
}
