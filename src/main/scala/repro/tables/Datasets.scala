package repro.tables

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.GraphGen

/** The Table 2 dataset suite — synthetic stand-ins for the paper's graphs
  * (substitution rationale in DESIGN.md). Two scales: "test" (unit-test
  * sized) and "bench" (the sizes EXPERIMENTS.md reports).
  */
final case class BenchGraph(
    name: String,
    paperName: String,
    weighted: Boolean,
    gen: SparkSession => DataFrame) {

  /** Generate, cache, and materialize the canonical edge DataFrame. */
  def load(spark: SparkSession): DataFrame = {
    val df = gen(spark).cache()
    df.count()
    df
  }
}

object Datasets {

  /** Dense graphs where the paper found LSH worthwhile (§7.3.3). */
  val denseNames: Set[String] = Set("brain-lite", "vessel-lite", "cochlea-lite")

  /** Suite restricted to `names` (None = all), preserving suite order. */
  def select(scale: String, names: Option[Seq[String]]): Seq[BenchGraph] =
    names match {
      case None     => suite(scale)
      case Some(ns) => suite(scale).filter(g => ns.contains(g.name))
    }

  def suite(scale: String): Seq[BenchGraph] = scale match {
    case "bench" =>
      Seq(
        BenchGraph("orkut-lite", "Orkut", weighted = false, s => GraphGen.rmat(s, 16, 600000L, seed = 11)),
        BenchGraph("brain-lite", "brain", weighted = false, s => GraphGen.erdosRenyi(s, 4096, 400000L, seed = 12)),
        BenchGraph("webbase-lite", "WebBase", weighted = false, s => GraphGen.rmat(s, 17, 400000L, seed = 13)),
        BenchGraph("friendster-lite", "Friendster", weighted = false, s => GraphGen.rmat(s, 16, 900000L, seed = 14)),
        BenchGraph("vessel-lite", "blood vessel", weighted = true, s => GraphGen.denseWeighted(s, 1500, 250000L, seed = 15)),
        BenchGraph("cochlea-lite", "cochlea", weighted = true, s => GraphGen.denseWeighted(s, 1500, 450000L, seed = 16)),
      )
    case "test" =>
      Seq(
        BenchGraph("orkut-lite", "Orkut", weighted = false, s => GraphGen.rmat(s, 10, 4000L, seed = 11)),
        BenchGraph("brain-lite", "brain", weighted = false, s => GraphGen.erdosRenyi(s, 256, 4000L, seed = 12)),
        BenchGraph("webbase-lite", "WebBase", weighted = false, s => GraphGen.rmat(s, 11, 3000L, seed = 13)),
        BenchGraph("friendster-lite", "Friendster", weighted = false, s => GraphGen.rmat(s, 10, 6000L, seed = 14)),
        BenchGraph("vessel-lite", "blood vessel", weighted = true, s => GraphGen.denseWeighted(s, 100, 1500L, seed = 15)),
        BenchGraph("cochlea-lite", "cochlea", weighted = true, s => GraphGen.denseWeighted(s, 100, 2500L, seed = 16)),
      )
    case other => throw new IllegalArgumentException(s"unknown scale '$other'")
  }
}
