package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.core.{LocalCpi, Tpa}
import repro.graph.{Datasets, DatasetSpec, LocalGraph}
import repro.baselines.{BearApprox, HubPpr, NbLin}

import scala.collection.mutable

/** Shared measurement machinery: wall-clock timing, markdown table
  * formatting, and per-dataset caches of exact vectors and preprocessed
  * baseline models so the per-figure experiments don't redo work.
  */
object Runner {

  /** A value plus the wall-clock milliseconds it took to produce. */
  final case class Timed[T](value: T, ms: Double)

  /** Time a thunk (single-shot wall clock, as in the paper). */
  def time[T](f: => T): Timed[T] = {
    val t0 = System.nanoTime()
    val v = f
    Timed(v, (System.nanoTime() - t0) / 1e6)
  }

  /** Render a markdown table. */
  def table(headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb.append(headers.mkString("| ", " | ", " |\n"))
    sb.append(headers.map(_ => "---").mkString("| ", " | ", " |\n"))
    rows.foreach(r => sb.append(r.mkString("| ", " | ", " |\n")))
    sb.toString
  }

  def fmtMs(ms: Double): String = f"$ms%.1f ms"
  def fmtSci(x: Double): String = f"$x%.3e"
  def fmtBytes(b: Long): String =
    if (b >= (1L << 20)) f"${b / 1048576.0}%.2f MB" else f"${b / 1024.0}%.1f KB"

  // ---- caches (benches run sequentially in one JVM) ----

  private val exactCache = mutable.Map.empty[(String, Int), Array[Double]]
  private val tpaCache = mutable.Map.empty[String, Timed[Tpa.Model]]
  private val nbLinCache = mutable.Map.empty[String, Option[Timed[NbLin.Model]]]
  private val bearCache = mutable.Map.empty[String, Option[Timed[BearApprox.Model]]]
  private val hubCache = mutable.Map.empty[String, Timed[HubPpr.Model]]

  /** Exact RWR vector (ground truth; CPI to ε = 1e-9), cached. */
  def exact(g: LocalGraph, spec: DatasetSpec, seed: Int): Array[Double] =
    exactCache.getOrElseUpdate((spec.name, seed),
      LocalCpi.rwr(g, seed, ExpConfig.c, ExpConfig.eps))

  /** Exact RWR on an arbitrary (non-registry) graph — not cached. */
  def exactOn(g: LocalGraph, seed: Int): Array[Double] =
    LocalCpi.rwr(g, seed, ExpConfig.c, ExpConfig.eps)

  /** TPA preprocessing (timed, cached per dataset). */
  def tpaModel(spark: SparkSession, spec: DatasetSpec): Timed[Tpa.Model] =
    tpaCache.getOrElseUpdate(spec.name, {
      val g = Datasets.local(spark, spec)
      time(Tpa.preprocess(g, ExpConfig.c, ExpConfig.eps, spec.t))
    })

  /** NB-LIN preprocessing; None when gated out (OOT in the paper). */
  def nbLinModel(spark: SparkSession, spec: DatasetSpec): Option[Timed[NbLin.Model]] =
    nbLinCache.getOrElseUpdate(spec.name, {
      if (spec.n > ExpConfig.nbLinMaxN) None
      else {
        val g = Datasets.local(spark, spec)
        Some(time(NbLin.preprocess(g, ExpConfig.c, ExpConfig.nbLinRank)))
      }
    })

  /** BEAR-APPROX preprocessing; None when gated out (OOT in the paper). */
  def bearModel(spark: SparkSession, spec: DatasetSpec): Option[Timed[BearApprox.Model]] =
    bearCache.getOrElseUpdate(spec.name, {
      if (spec.n > ExpConfig.bearMaxN) None
      else {
        val g = Datasets.local(spark, spec)
        val dropTol = 1.0 / math.sqrt(spec.n.toDouble)
        Some(time(BearApprox.preprocess(g, ExpConfig.c, ExpConfig.bearHubFrac, dropTol)))
      }
    })

  /** HubPPR hub-index preprocessing (timed, cached per dataset). */
  def hubPprModel(spark: SparkSession, spec: DatasetSpec): Timed[HubPpr.Model] =
    hubCache.getOrElseUpdate(spec.name, {
      val g = Datasets.local(spark, spec)
      time(HubPpr.preprocess(g, ExpConfig.c, ExpConfig.hubPprRmax, ExpConfig.hubPprHubs))
    })
}
