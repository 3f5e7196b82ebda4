package repro.baseline

import repro.core.Similarity
import scala.collection.mutable

/** Original SCAN (Xu et al. [71]) — sequential, per-query, no index.
  *
  * Computes all similarities on demand, finds cores, and runs the modified
  * BFS over ε-similar edges from core vertices. Serves as the independent
  * correctness reference for every other implementation in this repo
  * (its only shared code with them is the SeqGraph container).
  *
  * Border vertices are assigned with the deterministic most-similar-core
  * rule (§7.3.4), and cluster labels are the minimum core id per cluster,
  * matching the conventions in DESIGN.md.
  */
object SeqScan {

  /** Clustering at (μ, ε), recomputing sims from scratch. */
  def cluster(g: SeqGraph, measure: Similarity.Measure, mu: Int, eps: Double): Map[Long, Long] =
    clusterWithSims(g, similarityFn(g, measure), mu, eps)

  /** Per-edge similarity function (dense indices) computed by direct
    * closed-neighborhood intersection — no sharing with SeqScanIndex.
    */
  def similarityFn(g: SeqGraph, measure: Similarity.Measure): (Int, Int) => Double = {
    val unweighted = measure == Similarity.Jaccard
    val nbrSets = Array.tabulate(g.n)(v => g.adj(v).toSet)
    // Squared norms; the division below uses sqrt(nsqU * nsqV), the same FP
    // expression as the Spark implementation (bit-identical unweighted sims).
    val normSqs = Array.tabulate(g.n) { v =>
      var s = 1.0
      g.wts(v).foreach { w => val x = if (unweighted) 1.0 else w; s += x * x }
      s
    }
    (u: Int, v: Int) => {
      val w0 = g.weight(u, v)
      val w  = if (unweighted) 1.0 else w0
      var dot = 2.0 * w
      val ln = g.adj(u); val lw = g.wts(u)
      var i = 0
      while (i < ln.length) {
        val x = ln(i)
        if (x != v && nbrSets(v).contains(x)) {
          val wl = if (unweighted) 1.0 else lw(i)
          val wh = if (unweighted) 1.0 else g.weight(v, x)
          dot += wl * wh
        }
        i += 1
      }
      measure match {
        case Similarity.Cosine  => dot / math.sqrt(normSqs(u) * normSqs(v))
        case Similarity.Jaccard => dot / ((g.degree(u) + 1) + (g.degree(v) + 1) - dot)
      }
    }
  }

  /** SCAN clustering given an arbitrary similarity function — lets tests
    * feed Spark-computed sims in so weighted-graph comparisons are immune
    * to floating-point summation-order differences at the ε boundary.
    */
  def clusterWithSims(
      g: SeqGraph,
      sim: (Int, Int) => Double,
      mu: Int,
      eps: Double): Map[Long, Long] = {
    require(mu >= 2, s"SCAN requires mu >= 2, got $mu")
    // Cache sims per edge (computed once per unordered pair).
    val simCache = new mutable.LongMap[Double](2 * g.numEdges.toInt + 1)
    def simOf(u: Int, v: Int): Double = {
      val k = (math.min(u, v).toLong << 32) | (math.max(u, v).toLong & 0xffffffffL)
      simCache.getOrElseUpdate(k, sim(math.min(u, v), math.max(u, v)))
    }
    // ε-neighborhood sizes include the vertex itself (σ(v,v) = 1 ≥ ε).
    def epsDeg(v: Int): Int = 1 + g.adj(v).count(u => simOf(v, u) >= eps)
    val isCore = Array.tabulate(g.n)(v => g.degree(v) + 1 >= mu && epsDeg(v) >= mu)

    // BFS over cores along ε-similar core-core edges (structural
    // reachability); collect clusters of cores.
    val clusterOf = Array.fill(g.n)(-1)
    var nextCluster = 0
    val queue = mutable.Queue.empty[Int]
    var v = 0
    while (v < g.n) {
      if (isCore(v) && clusterOf(v) < 0) {
        clusterOf(v) = nextCluster
        queue.enqueue(v)
        while (queue.nonEmpty) {
          val x = queue.dequeue()
          g.adj(x).foreach { u =>
            if (isCore(u) && clusterOf(u) < 0 && simOf(x, u) >= eps) {
              clusterOf(u) = nextCluster
              queue.enqueue(u)
            }
          }
        }
        nextCluster += 1
      }
      v += 1
    }

    // Relabel clusters by minimum original core id.
    val minId = Array.fill(nextCluster)(Long.MaxValue)
    for (u <- 0 until g.n if isCore(u))
      minId(clusterOf(u)) = math.min(minId(clusterOf(u)), g.ids(u))

    val out = Map.newBuilder[Long, Long]
    for (u <- 0 until g.n if isCore(u)) out += g.ids(u) -> minId(clusterOf(u))

    // Borders: non-core ε-similar neighbors of cores, deterministic rule.
    for (u <- 0 until g.n if !isCore(u)) {
      var bestSim = -1.0
      var bestCore = -1
      g.adj(u).foreach { c =>
        if (isCore(c)) {
          val s = simOf(u, c)
          if (s >= eps &&
              (s > bestSim || (s == bestSim && g.ids(c) < g.ids(bestCore)))) {
            bestSim = s; bestCore = c
          }
        }
      }
      if (bestCore >= 0) out += g.ids(u) -> minId(clusterOf(bestCore))
    }
    out.result()
  }
}
