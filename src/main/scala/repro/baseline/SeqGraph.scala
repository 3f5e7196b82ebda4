package repro.baseline

import org.apache.spark.sql.DataFrame

/** Driver-side compact adjacency representation for the sequential
  * baselines (GS*-Index, original SCAN). Vertex ids are remapped to dense
  * ints 0..n-1 (ascending by original id); adjacency lists are sorted by
  * neighbor index — the precondition of the §6.1 merge-based triangle
  * counting, and what GBBS's file format guarantees.
  */
final class SeqGraph(
    val n: Int,
    val ids: Array[Long],              // dense index -> original vertex id
    val idOf: Map[Long, Int],          // original vertex id -> dense index
    val adj: Array[Array[Int]],        // sorted neighbor indices
    val wts: Array[Array[Double]]) {   // weights aligned with adj

  def degree(u: Int): Int = adj(u).length

  /** m = number of undirected edges. */
  val numEdges: Long = adj.iterator.map(_.length.toLong).sum / 2

  /** Canonical edge iterator (u < v by dense index). */
  def edges: Iterator[(Int, Int, Double)] =
    (0 until n).iterator.flatMap { u =>
      adj(u).iterator.zip(wts(u).iterator).filter(_._1 > u).map { case (v, w) => (u, v, w) }
    }

  /** Weight lookup via binary search on the sorted adjacency list. */
  def weight(u: Int, v: Int): Double = {
    val i = java.util.Arrays.binarySearch(adj(u), v)
    if (i >= 0) wts(u)(i) else 0.0
  }
}

object SeqGraph {

  /** Collect a canonical (src, dst, weight) DataFrame to the driver. */
  def fromDataFrame(canonical: DataFrame): SeqGraph = {
    val rows = canonical
      .select("src", "dst", "weight")
      .collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getDouble(2)))
    fromEdges(rows)
  }

  def fromEdges(rows: Array[(Long, Long, Double)]): SeqGraph = {
    val ids  = rows.flatMap(e => Array(e._1, e._2)).distinct.sorted
    val idOf = ids.zipWithIndex.toMap
    val n    = ids.length
    val degs = new Array[Int](n)
    rows.foreach { case (s, d, _) => degs(idOf(s)) += 1; degs(idOf(d)) += 1 }
    val adj = Array.tabulate(n)(i => new Array[Int](degs(i)))
    val wts = Array.tabulate(n)(i => new Array[Double](degs(i)))
    val pos = new Array[Int](n)
    rows.foreach { case (s, d, w) =>
      val (si, di) = (idOf(s), idOf(d))
      adj(si)(pos(si)) = di; wts(si)(pos(si)) = w; pos(si) += 1
      adj(di)(pos(di)) = si; wts(di)(pos(di)) = w; pos(di) += 1
    }
    // Sort each adjacency list by neighbor index, keeping weights aligned.
    var i = 0
    while (i < n) {
      val order = adj(i).indices.toArray.sortBy(adj(i))
      adj(i) = order.map(adj(i))
      wts(i) = order.map(wts(i))
      i += 1
    }
    new SeqGraph(n, ids, idOf, adj, wts)
  }
}
