package repro.baseline

import org.apache.spark.sql.DataFrame
import repro.{SparkSpec, TestUtil}
import repro.core.{ScanIndex, ScanQuery, Similarity}
import repro.graph.GraphGen

class BaselineSpec extends SparkSpec {

  private lazy val fig   = GraphGen.figureLike(spark).cache()
  private lazy val figSg = SeqGraph.fromDataFrame(fig)

  // ------------------------------------------------------------ SeqGraph --

  test("SeqGraph round-trips vertex ids and degrees") {
    val sg = figSg
    assert(sg.n == 10)
    assert(sg.numEdges == 15)
    val degById = (0 until sg.n).map(i => sg.ids(i) -> sg.degree(i)).toMap
    assert(degById(0L) == 4 && degById(8L) == 3 && degById(9L) == 1)
  }

  test("SeqGraph adjacency lists are sorted") {
    (0 until figSg.n).foreach { v =>
      assert(figSg.adj(v).sameElements(figSg.adj(v).sorted))
    }
  }

  test("SeqGraph.weight finds edge weights and returns 0 for non-edges") {
    val g  = GraphGen.fromWeightedEdges(spark, Seq((1L, 2L, 0.5), (2L, 3L, 0.75)))
    val sg = SeqGraph.fromDataFrame(g)
    assert(sg.weight(sg.idOf(1L), sg.idOf(2L)) == 0.5)
    assert(sg.weight(sg.idOf(2L), sg.idOf(3L)) == 0.75)
    assert(sg.weight(sg.idOf(1L), sg.idOf(3L)) == 0.0)
  }

  test("SeqGraph.edges yields each canonical edge once") {
    assert(figSg.edges.size == 15)
  }

  // ------------------------------------------------- sequential indexes --

  test("buildBasic and buildOpt produce identical neighbor orders (unweighted)") {
    val sg = SeqGraph.fromDataFrame(GraphGen.rmat(spark, 9, 2000, seed = 81))
    val a  = SeqScanIndex.buildBasic(sg, Similarity.Cosine)
    val b  = SeqScanIndex.buildOpt(sg, Similarity.Cosine)
    (0 until sg.n).foreach { v =>
      assert(a.noNbr(v).sameElements(b.noNbr(v)), s"NO nbr mismatch at $v")
      assert(a.noSim(v).sameElements(b.noSim(v)), s"NO sim mismatch at $v")
    }
    (2 to a.maxMu).foreach { mu =>
      assert(a.coVert(mu).sameElements(b.coVert(mu)), s"CO mismatch at mu=$mu")
    }
  }

  test("sequential index query equals sequential original SCAN across a grid") {
    val sg  = SeqGraph.fromDataFrame(GraphGen.rmat(spark, 10, 3000, seed = 82))
    val idx = SeqScanIndex.buildOpt(sg, Similarity.Cosine)
    for ((mu, eps) <- Seq((2, 0.3), (2, 0.7), (3, 0.5), (5, 0.4), (5, 0.8), (8, 0.6))) {
      val a = idx.cluster(mu, eps)
      val b = SeqScan.cluster(sg, Similarity.Cosine, mu, eps)
      assert(a == b, s"(mu=$mu, eps=$eps)")
    }
  }

  test("sequential index query equals the Spark index query across a grid") {
    val g     = GraphGen.erdosRenyi(spark, 250, 2000, seed = 83)
    val index = ScanIndex.build(g, Similarity.Cosine).cache()
    val sg    = SeqGraph.fromDataFrame(g)
    val sIdx  = SeqScanIndex.buildOpt(sg, Similarity.Cosine)
    for ((mu, eps) <- Seq((2, 0.4), (3, 0.6), (4, 0.5), (6, 0.3))) {
      val spark_ = TestUtil.clustersToMap(ScanQuery.cluster(index, mu, eps))
      val seq_   = sIdx.cluster(mu, eps)
      assert(spark_ == seq_, s"(mu=$mu, eps=$eps)")
    }
    index.unpersist()
  }

  test("sequential index cores are a sorted prefix (doubling search correctness)") {
    val sg  = SeqGraph.fromDataFrame(GraphGen.rmat(spark, 9, 1500, seed = 84))
    val idx = SeqScanIndex.buildOpt(sg, Similarity.Cosine)
    for (mu <- 2 to math.min(6, idx.maxMu); eps <- Seq(0.2, 0.5, 0.9)) {
      val cs = idx.cores(mu, eps).toSet
      // Brute-force definition check.
      val expect = (0 until sg.n).filter { v =>
        sg.degree(v) + 1 >= mu && {
          val sims = idx.noSim(v)
          sims.length >= mu - 1 && sims(mu - 2) >= eps
        }
      }.toSet
      assert(cs == expect, s"(mu=$mu, eps=$eps)")
    }
  }

  test("sequential hubs/outliers on figureLike at (mu=3, eps=0.8)") {
    val idx      = SeqScanIndex.buildOpt(figSg, Similarity.Cosine)
    val clusters = idx.cluster(3, 0.8)
    val roles    = idx.hubsAndOutliers(clusters)
    assert(roles == Map(8L -> "hub", 9L -> "outlier"))
  }

  // --------------------------------------------------------- ppSCAN-like --

  private def checkPpScan(name: String, g: => DataFrame, params: Seq[(Int, Double)]): Unit = {
    lazy val graph = g.cache()
    lazy val index = ScanIndex.build(graph, Similarity.Cosine).cache()
    for ((mu, eps) <- params) {
      test(s"ppSCAN-like equals the index query on $name at (mu=$mu, eps=$eps)") {
        val a = TestUtil.clustersToMap(PpScan.cluster(graph, Similarity.Cosine, mu, eps))
        val b = TestUtil.clustersToMap(ScanQuery.cluster(index, mu, eps))
        assert(a == b)
      }
    }
  }

  checkPpScan(
    "figureLike",
    GraphGen.figureLike(spark),
    Seq((2, 0.44), (3, 0.8), (2, 0.9), (4, 0.85)))
  checkPpScan(
    "rmat-9",
    GraphGen.rmat(spark, 9, 2200, seed = 85),
    Seq((2, 0.3), (3, 0.6), (5, 0.5), (5, 0.9)))
  checkPpScan(
    "dense-weighted-60",
    GraphGen.denseWeighted(spark, 60, 700, seed = 86),
    Seq((2, 0.5), (4, 0.7)))

  test("ppSCAN-like on jaccard equals the jaccard index query") {
    val g     = GraphGen.rmat(spark, 9, 1800, seed = 87).cache()
    val index = ScanIndex.build(g, Similarity.Jaccard).cache()
    for ((mu, eps) <- Seq((2, 0.3), (3, 0.5))) {
      val a = TestUtil.clustersToMap(PpScan.cluster(g, Similarity.Jaccard, mu, eps))
      val b = TestUtil.clustersToMap(ScanQuery.cluster(index, mu, eps))
      assert(a == b, s"(mu=$mu, eps=$eps)")
    }
    index.unpersist(); g.unpersist()
  }

  test("degree pruning bound is valid: pruned edges are never eps-similar") {
    val g    = GraphGen.rmat(spark, 9, 2000, seed = 88)
    val sims = TestUtil.simsToMap(Similarity.similarities(g, Similarity.Cosine))
    val sg   = SeqGraph.fromDataFrame(g)
    sims.foreach { case ((u, v), s) =>
      val du = sg.degree(sg.idOf(u)) + 1.0
      val dv = sg.degree(sg.idOf(v)) + 1.0
      val ub = math.sqrt(math.min(du, dv) / math.max(du, dv))
      assert(s <= ub + 1e-12, s"cosine ub violated on ($u,$v): $s > $ub")
    }
    val jsims = TestUtil.simsToMap(Similarity.similarities(g, Similarity.Jaccard))
    jsims.foreach { case ((u, v), s) =>
      val du = sg.degree(sg.idOf(u)) + 1.0
      val dv = sg.degree(sg.idOf(v)) + 1.0
      val ub = math.min(du, dv) / math.max(du, dv)
      assert(s <= ub + 1e-12, s"jaccard ub violated on ($u,$v): $s > $ub")
    }
  }
}
