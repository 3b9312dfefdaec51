package repro.bench

import repro.TestGraphs
import repro.core.{LocalCpi, Tpa}
import repro.experiments.{ExpConfig, Runner}
import repro.graph.Datasets
import repro.metrics.Metrics

/** Figure 8: effect of T (S fixed at 4). Paper (LiveJournal/Pokec):
  * L1 error falls as T grows toward ~10 then rebounds for large T,
  * while Spearman stays essentially flat in T.
  *
  * Our RMAT analogs mix much faster than the paper's multi-million-node
  * graphs (tiny diameter), so the PageRank tail is already accurate at
  * T = S and only the *large-T* penalty appears on them. The full
  * U-shape — both penalties, minimum at T ≈ 10 — reproduces on a
  * strong-community SBM graph, which has the locality the paper's
  * argument (and its real graphs) rely on. Both are printed; see
  * EXPERIMENTS.md for the discussion.
  */
class Fig8TSweepBench extends BenchBase {
  private val sFixed = 4
  private val tValues = Seq(4, 5, 6, 8, 10, 15, 20, 30)

  private def sweep(g: repro.graph.LocalGraph, seeds: Seq[Int],
                    exact: Int => Array[Double]): Seq[(Int, Double, Double)] =
    tValues.map { tVal =>
      val model = Tpa.preprocess(g, ExpConfig.c, ExpConfig.eps, tVal)
      val runs = seeds.map { s =>
        val v = Tpa.online(g, model, sFixed, s, ExpConfig.eps)
        val ex = exact(s)
        (Metrics.l1(v, ex), Metrics.spearman(v, ex))
      }
      (tVal, runs.map(_._1).sum / runs.size, runs.map(_._2).sum / runs.size)
    }

  test("Fig 8: T sweep — large-T penalty on analogs, full U-shape on SBM") {
    val rows = collection.mutable.ArrayBuffer.empty[Seq[String]]
    val analogSweeps = for (spec <- Seq(Datasets.livejournal, Datasets.pokec)) yield {
      val g = Datasets.local(spark, spec)
      val seeds = Datasets.seedNodes(spec, ExpConfig.numSeeds)
      val sw = sweep(g, seeds, s => Runner.exact(g, spec, s))
      sw.foreach { case (t, l1, sp) =>
        rows += Seq(spec.name, t.toString, Runner.fmtSci(l1), f"$sp%.4f")
      }
      (spec.name, sw)
    }
    // Strong-community SBM: n=4096, 32 blocks, 95% in-block edges.
    val sbm = TestGraphs.communities(4096, 32, 40000, 0.95, 77)
    val sbmSeeds = Seq(1, 100, 2000, 3000, 4001)
    val sbmExact = sbmSeeds.map(s =>
      s -> LocalCpi.rwr(sbm, s, ExpConfig.c, ExpConfig.eps)).toMap
    val sbmSweep = sweep(sbm, sbmSeeds, sbmExact)
    sbmSweep.foreach { case (t, l1, sp) =>
      rows += Seq("sbm-community", t.toString, Runner.fmtSci(l1), f"$sp%.4f")
    }
    banner("Fig 8: effect of T (S=4)",
      Runner.table(Seq("dataset", "T", "L1 error", "Spearman"), rows.toSeq))

    for ((name, sw) <- analogSweeps) {
      val byT = sw.map(x => x._1 -> x).toMap
      // large-T penalty: the tuned T=10 beats the largest swept T
      assert(byT(10)._2 <= byT(30)._2 + 1e-9,
        s"$name: L1(T=10) ${byT(10)._2} !<= L1(T=30) ${byT(30)._2}")
      // Spearman stays high and essentially flat in T
      assert(sw.forall(_._3 > 0.8), s"$name: Spearman dipped below 0.8")
      assert(sw.map(_._3).max - sw.map(_._3).min < 0.1,
        s"$name: Spearman varied by more than 0.1 across T")
    }
    // full U-shape on the strong-community graph, minimum at the tuned T=10
    val byT = sbmSweep.map(x => x._1 -> x).toMap
    assert(byT(10)._2 < byT(4)._2,
      s"sbm: L1(T=10) ${byT(10)._2} !< L1(T=4) ${byT(4)._2}")
    assert(byT(10)._2 < byT(30)._2,
      s"sbm: L1(T=10) ${byT(10)._2} !< L1(T=30) ${byT(30)._2}")
    // Spearman flat in T on the SBM as well (level is tie-depressed)
    assert(sbmSweep.map(_._3).max - sbmSweep.map(_._3).min < 0.1)
  }
}
