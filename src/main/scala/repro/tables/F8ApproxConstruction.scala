package repro.tables

import org.apache.spark.sql.SparkSession
import repro.approx.ApproxSimilarity
import repro.core.{ScanIndex, Similarity}
import repro.util.Timing
import TableResult.secs

/** Figure 8: approximate index construction times with varying numbers of
  * LSH samples k (SimHash for cosine; k-partition MinHash for Jaccard —
  * Jaccard only on unweighted graphs, as in the paper). The exact
  * construction time is reported alongside as the reference line.
  *
  * Each trial uses a fresh pseudorandom seed, as in §7.3.3.
  */
object F8ApproxConstruction {

  val defaultKs: Seq[Int] = Seq(4, 16, 64, 256)

  def run(
      spark: SparkSession,
      scale: String,
      ks: Seq[Int] = defaultKs,
      trials: Int = 2,
      graphNames: Option[Seq[String]] = None): TableResult = {
    var seedCounter = 1000L
    val rows = Datasets.select(scale, graphNames).flatMap { bg =>
      val edges = bg.load(spark)
      val measures: Seq[(String, Similarity.Measure)] =
        if (bg.weighted) Seq("cosine" -> Similarity.Cosine)
        else Seq("cosine" -> Similarity.Cosine, "jaccard" -> Similarity.Jaccard)

      val out = measures.flatMap { case (mname, measure) =>
        val (_, tExact) = Timing.medianTime(trials) {
          val idx = ScanIndex.build(edges, measure).cache().materialize()
          idx.unpersist()
          idx
        }
        ks.map { k =>
          val (_, tApprox) = Timing.medianTime(trials) {
            seedCounter += 1
            val idx = ApproxSimilarity.buildIndex(edges, measure, k, seedCounter).cache().materialize()
            idx.unpersist()
            idx
          }
          Seq(bg.name, mname, k.toString, secs(tApprox), secs(tExact))
        }
      }
      edges.unpersist()
      out
    }
    TableResult(
      s"Figure 8 (scale=$scale): approx index construction time vs k [s]",
      Seq("graph", "measure", "k", "approx", "exact(ref)"),
      rows)
  }
}
