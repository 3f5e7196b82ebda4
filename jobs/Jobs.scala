package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.tables._

/** Shared SparkSession setup for the spark-submit entrypoints. Each table
  * of the paper's evaluation has one job object: run with
  *   spark-submit --class repro.jobs.<Name> <jar> [scale]
  * where scale is "test" (tiny) or "bench" (default: bench).
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def scaleArg(args: Array[String]): String =
    args.headOption.getOrElse("bench")

  def runAndPrint(name: String, args: Array[String])(f: (SparkSession, String) => TableResult): Unit = {
    val spark = session(name)
    try println(f(spark, scaleArg(args)).render)
    finally spark.stop()
  }
}

/** Table 2: dataset summary. */
object Table2Job {
  def main(args: Array[String]): Unit =
    Jobs.runAndPrint("table2", args)((s, sc) => T2Datasets.run(s, sc))
}

/** Figure 5: exact index construction times. */
object Fig5Job {
  def main(args: Array[String]): Unit =
    Jobs.runAndPrint("fig5", args)((s, sc) => F5Construction.run(s, sc))
}

/** Figure 6: query time vs ε (μ = 5). */
object Fig6Job {
  def main(args: Array[String]): Unit =
    Jobs.runAndPrint("fig6", args)((s, sc) => F6EpsSweep.run(s, sc))
}

/** Figure 7: query time vs μ (ε = 0.6). */
object Fig7Job {
  def main(args: Array[String]): Unit =
    Jobs.runAndPrint("fig7", args)((s, sc) => F7MuSweep.run(s, sc))
}

/** Figure 8: approximate index construction times vs k. */
object Fig8Job {
  def main(args: Array[String]): Unit =
    Jobs.runAndPrint("fig8", args)((s, sc) => F8ApproxConstruction.run(s, sc))
}

/** Figure 9: best-modularity trade-off vs k. */
object Fig9Job {
  def main(args: Array[String]): Unit =
    Jobs.runAndPrint("fig9", args)((s, sc) => F9Modularity.run(s, sc))
}

/** Figure 10: ARI of approximate clustering vs exact. */
object Fig10Job {
  def main(args: Array[String]): Unit =
    Jobs.runAndPrint("fig10", args)((s, sc) => F10Ari.run(s, sc))
}
