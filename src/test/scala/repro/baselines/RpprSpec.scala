package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.LocalCpi
import repro.metrics.Metrics

/** RPPR/BRPPR push correctness: both converge to the exact RWR as their
  * expansion thresholds go to zero, with the analytic error bounds of
  * the push invariant (residual mass bounds the L1 error).
  */
class RpprSpec extends AnyFunSuite {
  val c = 0.15

  val graphs = Seq(
    "random-150" -> TestGraphs.random(150, 900, 21),
    "communities-200" -> TestGraphs.communities(200, 5, 1200, 0.85, 22),
    "cycle-40" -> TestGraphs.cycle(40))

  for ((name, g) <- graphs; seed <- Seq(0, 7, 13)) {
    test(s"RPPR converges to exact RWR as θ→0 on $name seed $seed") {
      val exact = LocalCpi.rwr(g, seed, c, 1e-12)
      val approx = Rppr.rppr(g, seed, c, theta = 1e-10).scores
      // residual ≤ θ per node ⇒ total error ≤ n·θ
      assert(Metrics.l1(exact, approx) <= g.n * 1e-10 + 1e-9)
    }
  }

  for ((name, g) <- graphs; seed <- Seq(0, 5)) {
    test(s"RPPR error shrinks with θ on $name seed $seed") {
      val exact = LocalCpi.rwr(g, seed, c, 1e-12)
      val coarse = Metrics.l1(exact, Rppr.rppr(g, seed, c, 1e-2).scores)
      val fine = Metrics.l1(exact, Rppr.rppr(g, seed, c, 1e-6).scores)
      assert(fine <= coarse + 1e-12)
    }
  }

  for ((name, g) <- graphs; kappa <- Seq(1e-1, 1e-2, 1e-4); seed = 3) {
    test(s"BRPPR error ≤ κ=$kappa on $name (push invariant)") {
      val exact = LocalCpi.rwr(g, seed, c, 1e-12)
      val approx = Rppr.brppr(g, seed, c, kappa).scores
      // r_exact − p = Σ_v res(v)·rwr_v, and each rwr_v has L1 norm ≤ 1,
      // so ‖error‖₁ ≤ total residual < κ at termination.
      assert(Metrics.l1(exact, approx) <= kappa + 1e-9)
    }
  }

  for ((name, g) <- graphs) {
    test(s"RPPR estimate is a sub-probability vector on $name") {
      val r = Rppr.rppr(g, 1, c, 1e-4)
      assert(r.scores.forall(_ >= 0.0))
      assert(Metrics.norm1(r.scores) <= 1.0 + 1e-9)
    }
  }

  test("RPPR counts pushes and edge traversals") {
    val g = graphs.head._2
    val r = Rppr.rppr(g, 0, c, 1e-6)
    assert(r.pushes > 0 && r.edgeTraversals >= r.pushes)
  }

  test("BRPPR with κ ≥ 1 does almost no work") {
    val g = graphs.head._2
    val r = Rppr.brppr(g, 0, c, kappa = 1.0)
    assert(r.pushes <= 1)
  }

  test("RPPR respects maxPushes cap") {
    val g = graphs.head._2
    val r = Rppr.rppr(g, 0, c, 1e-10, maxPushes = 5)
    assert(r.pushes <= 5)
  }

  test("coarse RPPR concentrates mass near the seed (locality)") {
    val g = TestGraphs.communities(200, 5, 1200, 0.9, 23)
    val r = Rppr.rppr(g, 0, c, 1e-3).scores
    // the seed retains the single largest score
    assert(r(0) == r.max)
  }
}
