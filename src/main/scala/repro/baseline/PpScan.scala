package repro.baseline

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.{ScanQuery, Similarity}
import repro.graph.GraphOps

/** ppSCAN-like baseline (Che et al. [18]): a parallel, per-query,
  * *index-free* SCAN with pruning. For each query (μ, ε) it recomputes
  * only the similarities that can matter:
  *
  * - degree pruning: σ(u,v) ≤ sqrt(min(|N̄u|,|N̄v|)/max(...)) for cosine and
  *   ≤ min/max for Jaccard, so edges whose upper bound is below ε are
  *   skipped (they can be neither core-qualifying nor cluster edges);
  * - core-relevance pruning: an edge can only influence the output if at
  *   least one endpoint can be a core (|N̄| ≥ μ).
  *
  * The clustering tail (connectivity + border assignment) is shared with
  * the index query so the two produce identical outputs — the experiment
  * in Figures 6–7 measures exactly this recompute-vs-index gap.
  */
object PpScan {

  /** Full clustering for (μ, ε) without any precomputed index. */
  def cluster(
      canonical: DataFrame,
      measure: Similarity.Measure,
      mu: Int,
      eps: Double): DataFrame = {
    require(mu >= 2, s"SCAN requires mu >= 2, got $mu")
    val spark = canonical.sparkSession
    val deg   = GraphOps.degrees(canonical)

    val withDegs = canonical
      .join(deg.select(col("v").as("sv"), (col("deg") + 1).as("ds")), col("src") === col("sv"))
      .join(deg.select(col("v").as("dv"), (col("deg") + 1).as("dd")), col("dst") === col("dv"))
      .select(col("src"), col("dst"), col("ds"), col("dd"))

    val ub = measure match {
      case Similarity.Cosine  => sqrt(least(col("ds"), col("dd")) / greatest(col("ds"), col("dd")))
      case Similarity.Jaccard => least(col("ds"), col("dd")) / greatest(col("ds"), col("dd"))
    }
    val candidates = withDegs
      .filter(greatest(col("ds"), col("dd")) >= mu) // some endpoint can be a core
      .filter(ub >= eps)                            // similarity can reach ε
      .select("src", "dst")

    val sims = Similarity.similaritiesForEdges(canonical, candidates, measure)

    // Core detection: |N_ε(v)| = 1 + #(ε-similar neighbors); edges pruned
    // above could not have had sim ≥ ε, so the count over computed sims is
    // exact for any vertex with |N̄(v)| ≥ μ.
    val simsSym = sims
      .select(col("src").as("v"), col("dst").as("nbr"), col("sim"))
      .unionByName(sims.select(col("dst").as("v"), col("src").as("nbr"), col("sim")))
    val epsCounts = simsSym.filter(col("sim") >= eps).groupBy("v").agg(count(lit(1)).as("cnt"))
    val coresDf = deg
      .filter(col("deg") + 1 >= mu)
      .join(epsCounts, Seq("v"), "left")
      .filter(lit(1) + coalesce(col("cnt"), lit(0L)) >= mu)
      .select("v")

    val simEdges = simsSym.filter(col("sim") >= eps).join(coresDf, Seq("v"))
    ScanQuery.clusterFrom(spark, coresDf, simEdges)
  }
}
