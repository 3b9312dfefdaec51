package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.baselines.{HubPpr, NbLin, BearApprox, Rppr}
import repro.core.{LocalCpi, Tpa}
import repro.graph.{Datasets, DatasetSpec, LocalGraph}
import repro.metrics.Metrics

import scala.collection.mutable

/** One function per reproduced paper exhibit (Table II and Figures 1,
  * 3–8 rendered as tables of numbers). Each returns a markdown table;
  * bench suites assert the qualitative claims and print it, jobs just
  * print it. See DESIGN.md §6 and EXPERIMENTS.md for paper-vs-measured.
  */
object Experiments {
  import Runner._

  /** Per-method online statistics averaged over seeds. */
  final case class MethodStats(method: String, avgMs: Double, avgL1: Double,
                               avgSpearman: Double, note: String = "") {
    def available: Boolean = note != "OOT"
  }

  private val onlineCache = mutable.Map.empty[String, Seq[MethodStats]]

  /** Run every online method on a dataset, measuring time and accuracy
    * against the exact RWR for each seed. Cached per dataset.
    */
  def onlineStats(spark: SparkSession, spec: DatasetSpec): Seq[MethodStats] =
    onlineCache.getOrElseUpdate(spec.name, {
      val g = Datasets.local(spark, spec)
      val seeds = Datasets.seedNodes(spec, ExpConfig.numSeeds)
      val exacts = seeds.map(s => (s, exact(g, spec, s))).toMap

      def stats(name: String, seedSubset: Seq[Int], note: String = "")
               (run: Int => Array[Double]): MethodStats = {
        val timed = seedSubset.map { s => (s, time(run(s))) }
        MethodStats(
          name,
          timed.map(_._2.ms).sum / timed.size,
          timed.map { case (s, t) => Metrics.l1(t.value, exacts(s)) }.sum / timed.size,
          timed.map { case (s, t) => Metrics.spearman(t.value, exacts(s)) }.sum / timed.size,
          note)
      }
      def oot(name: String) = MethodStats(name, Double.NaN, Double.NaN, Double.NaN, "OOT")

      val tpa = tpaModel(spark, spec).value
      val out = mutable.ArrayBuffer.empty[MethodStats]
      out += stats("TPA", seeds)(s => Tpa.online(g, tpa, spec.s, s, ExpConfig.eps))
      out += stats("TPA-NA", seeds)(s =>
        Tpa.onlineNA(g, ExpConfig.c, spec.s, spec.t, s, ExpConfig.eps))
      out += stats("RPPR", seeds)(s =>
        Rppr.rppr(g, s, ExpConfig.c, ExpConfig.rpprTheta).scores)
      out += stats("BRPPR", seeds)(s =>
        Rppr.brppr(g, s, ExpConfig.c, ExpConfig.brpprKappa).scores)
      out += (nbLinModel(spark, spec) match {
        case Some(m) => stats("NB-LIN", seeds)(s => NbLin.query(m.value, s))
        case None    => oot("NB-LIN")
      })
      out += (bearModel(spark, spec) match {
        case Some(m) => stats("BEAR-APPROX", seeds)(s => BearApprox.query(m.value, s))
        case None    => oot("BEAR-APPROX")
      })
      out += {
        if (spec.n > ExpConfig.hubPprOnlineMaxN) oot("HubPPR")
        else {
          val m = hubPprModel(spark, spec).value
          val rng = new scala.util.Random(7)
          stats("HubPPR", seeds.take(ExpConfig.hubPprSeeds),
                note = s"${ExpConfig.hubPprSeeds} seeds") { s =>
            HubPpr.fullVector(m, g, s, ExpConfig.hubPprWalks, rng,
                              ExpConfig.hubPprDeadlineMs)._1
          }
        }
      }
      out.toSeq
    })

  // ---- Table II ----

  /** Table II: realized analog statistics next to the paper's graphs. */
  def tableII(spark: SparkSession): String = {
    val rows = Datasets.all.map { spec =>
      val m = Datasets.edges(spark, spec).count()
      Seq(spec.name, spec.n.toString, m.toString,
          spec.paperNodes.toString, spec.paperEdges.toString,
          spec.s.toString, spec.t.toString)
    }
    table(Seq("dataset", "n", "m", "paper n", "paper m", "S", "T"), rows)
  }

  // ---- Figure 1(a): preprocessing time ----

  def fig1aPreprocess(spark: SparkSession): String = {
    val rows = Datasets.all.map { spec =>
      val tpa = tpaModel(spark, spec)
      val nb = nbLinModel(spark, spec).map(t => fmtMs(t.ms)).getOrElse("OOT")
      val bear = bearModel(spark, spec).map(t => fmtMs(t.ms)).getOrElse("OOT")
      val hub = fmtMs(hubPprModel(spark, spec).ms)
      Seq(spec.name, fmtMs(tpa.ms), nb, bear, hub)
    }
    table(Seq("dataset", "TPA", "NB-LIN", "BEAR-APPROX", "HubPPR"), rows)
  }

  // ---- Figure 1(b)/(c), Figure 4: online time / L1 / Spearman ----

  private def onlineTable(spark: SparkSession, col: MethodStats => String,
                          metric: String): String = {
    val methods = Seq("TPA", "RPPR", "BRPPR", "NB-LIN", "BEAR-APPROX", "HubPPR")
    val rows = Datasets.all.map { spec =>
      val st = onlineStats(spark, spec).map(s => s.method -> s).toMap
      spec.name +: methods.map(m => if (st(m).available) col(st(m)) else "OOT")
    }
    table(s"dataset ($metric)" +: methods, rows.map(_.toSeq))
  }

  def fig1bOnline(spark: SparkSession): String =
    onlineTable(spark, s => fmtMs(s.avgMs), "online time")

  def fig1cL1(spark: SparkSession): String =
    onlineTable(spark, s => fmtSci(s.avgL1), "L1 error")

  def fig4Spearman(spark: SparkSession): String =
    onlineTable(spark, s => f"${s.avgSpearman}%.4f", "Spearman")

  // ---- Figure 3: preprocessed-data memory ----

  def fig3Memory(spark: SparkSession): String = {
    val rows = Datasets.all.map { spec =>
      val m = Datasets.edges(spark, spec).count()
      val graphBytes = 8L * m // shared input (CSR edges), charged to all
      val tpa = fmtBytes(tpaModel(spark, spec).value.memoryBytes)
      val nb = nbLinModel(spark, spec).map(t => fmtBytes(t.value.memoryBytes)).getOrElse("OOT")
      val bear = bearModel(spark, spec).map(t => fmtBytes(t.value.memoryBytes)).getOrElse("OOT")
      val hub = fmtBytes(hubPprModel(spark, spec).value.memoryBytes)
      Seq(spec.name, fmtBytes(graphBytes), tpa, nb, bear, hub)
    }
    table(Seq("dataset", "(graph)", "TPA", "NB-LIN", "BEAR-APPROX", "HubPPR"), rows)
  }

  // ---- Figure 5: stranger approximation effectiveness (TPA vs TPA-NA) ----

  def fig5Stranger(spark: SparkSession): String = {
    val rows = Datasets.all.map { spec =>
      val st = onlineStats(spark, spec).map(s => s.method -> s).toMap
      Seq(spec.name,
          fmtSci(st("TPA").avgL1), fmtSci(st("TPA-NA").avgL1),
          f"${st("TPA").avgSpearman}%.4f", f"${st("TPA-NA").avgSpearman}%.4f")
    }
    table(Seq("dataset", "TPA L1", "TPA-NA L1", "TPA Spearman", "TPA-NA Spearman"), rows)
  }

  // ---- Figure 6: neighbor approximation, real-like vs random graphs ----

  def fig6Neighbor(spark: SparkSession): String = {
    val rows = Datasets.all.map { spec =>
      val gReal = Datasets.local(spark, spec)
      val gRand = Datasets.randomCounterpartLocal(spark, spec)
      val seeds = Datasets.seedNodes(spec, ExpConfig.numSeeds)
      def run(g: LocalGraph, cached: Boolean): (Double, Double) = {
        val pairs = seeds.map { s =>
          val ex = if (cached) exact(g, spec, s) else exactOn(g, s)
          val na = Tpa.onlineNA(g, ExpConfig.c, spec.s, spec.t, s, ExpConfig.eps)
          (Metrics.l1(na, ex), Metrics.spearman(na, ex))
        }
        (pairs.map(_._1).sum / pairs.size, pairs.map(_._2).sum / pairs.size)
      }
      val (l1Real, spReal) = run(gReal, cached = true)
      val (l1Rand, spRand) = run(gRand, cached = false)
      Seq(spec.name, fmtSci(l1Real), fmtSci(l1Rand),
          f"$spReal%.4f", f"$spRand%.4f")
    }
    table(Seq("dataset", "TPA-NA L1 (real-like)", "TPA-NA L1 (random)",
              "Spearman (real-like)", "Spearman (random)"), rows)
  }

  // ---- Figure 7: effect of S (T = 10) on online time and L1 ----

  def fig7SSweep(spark: SparkSession, specs: Seq[DatasetSpec] =
      Seq(Datasets.livejournal, Datasets.pokec)): String = {
    val tFixed = 10
    val rows = for {
      spec <- specs
      g = Datasets.local(spark, spec)
      // Reuse the registry stranger vector only when it was built with T=10.
      model = if (spec.t == tFixed)
                Tpa.Model(tpaModel(spark, spec).value.stranger, ExpConfig.c, -1, tFixed)
              else Tpa.preprocess(g, ExpConfig.c, ExpConfig.eps, tFixed)
      sVal <- 1 to 8
    } yield {
      val seeds = Datasets.seedNodes(spec, ExpConfig.numSeeds)
      val runs = seeds.map { s =>
        val t = time(Tpa.online(g, model, sVal, s, ExpConfig.eps))
        (t.ms, Metrics.l1(t.value, exact(g, spec, s)))
      }
      Seq(spec.name, sVal.toString,
          fmtMs(runs.map(_._1).sum / runs.size),
          fmtSci(runs.map(_._2).sum / runs.size))
    }
    table(Seq("dataset", "S", "online time", "L1 error"), rows)
  }

  // ---- Figure 8: effect of T (S = 4) on L1 and Spearman ----

  def fig8TSweep(spark: SparkSession, specs: Seq[DatasetSpec] =
      Seq(Datasets.livejournal, Datasets.pokec),
      tValues: Seq[Int] = Seq(4, 5, 6, 8, 10, 15, 20, 30)): String = {
    val sFixed = 4
    val rows = for {
      spec <- specs
      g = Datasets.local(spark, spec)
      tVal <- tValues
    } yield {
      val model = Tpa.preprocess(g, ExpConfig.c, ExpConfig.eps, tVal)
      val seeds = Datasets.seedNodes(spec, ExpConfig.numSeeds)
      val runs = seeds.map { s =>
        val v = Tpa.online(g, model, sFixed, s, ExpConfig.eps)
        val ex = exact(g, spec, s)
        (Metrics.l1(v, ex), Metrics.spearman(v, ex))
      }
      Seq(spec.name, tVal.toString,
          fmtSci(runs.map(_._1).sum / runs.size),
          f"${runs.map(_._2).sum / runs.size}%.4f")
    }
    table(Seq("dataset", "T", "L1 error", "Spearman"), rows)
  }
}
