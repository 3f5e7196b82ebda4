package repro.tables

import org.apache.spark.sql.SparkSession
import repro.baseline.{SeqGraph, SeqScanIndex}
import repro.core.{ScanIndex, Similarity}
import repro.util.Timing
import TableResult.{secs, x}

/** Figure 5: exact index construction times (cosine similarity).
  *
  * Columns mirror the figure's bars:
  *  - GS*-Index    → sequential GS*-style build (hash-set intersection sims)
  *  - ours (seq)   → sequential build with the §6.1 directed merge-based
  *                   triangle counting ("GBBSIndexSCAN, 1 thread")
  *  - ours (spark) → the parallel Spark dataflow build
  * plus the two headline speedup ratios the paper reports: seq-vs-GS*
  * (paper: 1.4–2.2×) and parallel-vs-GS* (paper: 50–151×, on 48c/96t).
  */
object F5Construction {

  def run(
      spark: SparkSession,
      scale: String,
      trials: Int = 2,
      graphNames: Option[Seq[String]] = None): TableResult = {
    val rows = Datasets.select(scale, graphNames).map { bg =>
      val edges = bg.load(spark)
      val g     = SeqGraph.fromDataFrame(edges)

      val (_, tBasic) = Timing.medianTime(trials)(SeqScanIndex.buildBasic(g, Similarity.Cosine))
      val (_, tOpt)   = Timing.medianTime(trials)(SeqScanIndex.buildOpt(g, Similarity.Cosine))
      val (_, tSpark) = Timing.medianTime(trials) {
        // cache() before materialize(): sims feed both orders, and build
        // time must not count the recomputation of uncached lineage.
        val idx = ScanIndex.build(edges, Similarity.Cosine).cache().materialize()
        idx.unpersist()
        idx
      }
      edges.unpersist()
      Seq(
        bg.name,
        secs(tBasic),
        secs(tOpt),
        secs(tSpark),
        x(tBasic / tOpt),
        x(tBasic / tSpark))
    }
    TableResult(
      s"Figure 5 (scale=$scale): exact index construction time, cosine [s]",
      Seq("graph", "GS*-Index(seq)", "ours(seq)", "ours(spark)", "seq speedup", "spark speedup"),
      rows)
  }
}
