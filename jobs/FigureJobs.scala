package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.{Experiments, SparkScale}

/** Table II — dataset statistics of the scaled analogs. */
object DatasetStatsJob extends JobBase {
  val title = "Table II: datasets"
  def run(spark: SparkSession): String = Experiments.tableII(spark)
}

/** Figure 1(a) — preprocessing time per method. */
object PreprocessJob extends JobBase {
  val title = "Fig 1(a): preprocessing time"
  def run(spark: SparkSession): String = Experiments.fig1aPreprocess(spark)
}

/** Figure 1(b) — online time per method. */
object OnlineJob extends JobBase {
  val title = "Fig 1(b): online time"
  def run(spark: SparkSession): String = Experiments.fig1bOnline(spark)
}

/** Figures 1(c) and 4 — L1 error and Spearman rank accuracy. */
object AccuracyJob extends JobBase {
  val title = "Fig 1(c): L1 error / Fig 4: Spearman"
  def run(spark: SparkSession): String =
    Experiments.fig1cL1(spark) + "\n" + Experiments.fig4Spearman(spark)
}

/** Figure 3 — preprocessed-data memory per method. */
object MemoryJob extends JobBase {
  val title = "Fig 3: preprocessed-data memory"
  def run(spark: SparkSession): String = Experiments.fig3Memory(spark)
}

/** Figure 5 — stranger approximation effectiveness (TPA vs TPA-NA). */
object StrangerJob extends JobBase {
  val title = "Fig 5: stranger approximation"
  def run(spark: SparkSession): String = Experiments.fig5Stranger(spark)
}

/** Figure 6 — neighbor approximation on real-like vs random graphs. */
object NeighborJob extends JobBase {
  val title = "Fig 6: neighbor approximation"
  def run(spark: SparkSession): String = Experiments.fig6Neighbor(spark)
}

/** Figure 7 — effect of S on online time and L1 error. */
object SSweepJob extends JobBase {
  val title = "Fig 7: effect of S"
  def run(spark: SparkSession): String = Experiments.fig7SSweep(spark)
}

/** Figure 8 — effect of T on L1 error and Spearman. */
object TSweepJob extends JobBase {
  val title = "Fig 8: effect of T"
  def run(spark: SparkSession): String = Experiments.fig8TSweep(spark)
}

/** Distributed TPA (DataFrame + GraphX engines) on a large analog. */
object SparkScaleJob extends JobBase {
  val title = "Distributed TPA (DataFrame / GraphX)"
  def run(spark: SparkSession): String = SparkScale.run(spark)
}
