package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.baselines.PowerIteration
import repro.metrics.Metrics

/** CPI-IMPL (Algorithm 1) correctness: Theorem 1 (CPI = PI), agreement
  * with an independent dense solve, the exact L1 norms of Lemma 3, and
  * the family/neighbor/stranger partition identity.
  */
class LocalCpiSpec extends AnyFunSuite {
  val c = 0.15
  val eps = 1e-12

  val graphs = Seq(
    "random-200" -> TestGraphs.random(200, 1200, 1),
    "communities-240" -> TestGraphs.communities(240, 6, 1400, 0.85, 2),
    "cycle-50" -> TestGraphs.cycle(50))

  for ((name, g) <- graphs; seed <- Seq(0, 3, 7, 11, 19, 23, 42 % g.n, 13, 17, 29)) {
    test(s"Theorem 1: CPI equals power iteration on $name seed $seed") {
      val cpi = LocalCpi.rwr(g, seed, c, eps)
      val pi = PowerIteration.rwr(g, seed, c, eps)
      assert(Metrics.l1(cpi, pi) < 1e-8)
    }
  }

  for ((name, g) <- graphs.take(2); seed <- Seq(0, 5, 9)) {
    test(s"CPI equals dense linear solve on $name seed $seed") {
      val cpi = LocalCpi.rwr(g, seed, c, eps)
      val dense = TestGraphs.denseSolve(g, LocalCpi.unitSeed(g.n, seed), c)
      assert(Metrics.l1(cpi, dense) < 1e-8)
    }
  }

  for ((name, g) <- graphs; seed <- Seq(1, 4)) {
    test(s"RWR vector sums to 1 on dangling-free $name seed $seed") {
      val r = LocalCpi.rwr(g, seed, c, eps)
      assert(math.abs(Metrics.norm1(r) - 1.0) < 1e-7)
    }
  }

  for ((name, g) <- graphs) {
    test(s"PageRank vector sums to 1 on $name") {
      val p = LocalCpi.pagerank(g, c, eps)
      assert(math.abs(Metrics.norm1(p) - 1.0) < 1e-7)
    }
  }

  for (s <- 1 to 6) {
    test(s"Lemma 3: family norm is 1-(1-c)^S for S=$s") {
      val g = graphs.head._2
      val fam = LocalCpi.run(g, LocalCpi.unitSeed(g.n, 0), c, 0.0, 0, s - 1)
      assert(math.abs(Metrics.norm1(fam) - (1 - math.pow(1 - c, s))) < 1e-10)
    }
  }

  for ((s, t) <- Seq((1, 3), (2, 5), (4, 10), (4, 15), (3, 8), (2, 20))) {
    test(s"Lemma 3: neighbor norm is (1-c)^S-(1-c)^T for S=$s T=$t") {
      val g = graphs(1)._2
      val nbr = LocalCpi.run(g, LocalCpi.unitSeed(g.n, 5), c, 0.0, s, t - 1)
      val expected = math.pow(1 - c, s) - math.pow(1 - c, t)
      assert(math.abs(Metrics.norm1(nbr) - expected) < 1e-10)
    }
  }

  for ((s, t) <- Seq((2, 6), (4, 10), (3, 15), (1, 4), (5, 12))) {
    test(s"partition identity: family+neighbor+stranger = full CPI (S=$s, T=$t)") {
      val g = graphs.head._2
      val q = LocalCpi.unitSeed(g.n, 7)
      val full = LocalCpi.run(g, q, c, eps, 0, Int.MaxValue)
      val fam = LocalCpi.run(g, q, c, 0.0, 0, s - 1)
      val nbr = LocalCpi.run(g, q, c, 0.0, s, t - 1)
      val str = LocalCpi.run(g, q, c, eps, t, Int.MaxValue)
      val sum = Array.tabulate(g.n)(i => fam(i) + nbr(i) + str(i))
      assert(Metrics.l1(full, sum) < 1e-8)
    }
  }

  test("interim norm decays as c(1-c)^i on dangling-free graphs") {
    val g = graphs.head._2
    for (i <- 0 until 8) {
      val xi = LocalCpi.run(g, LocalCpi.unitSeed(g.n, 3), c, 0.0, i, i)
      assert(math.abs(Metrics.norm1(xi) - c * math.pow(1 - c, i)) < 1e-10)
    }
  }

  test("dangling node leaks mass: RWR sums below 1") {
    val g = TestGraphs.withDangling(100, 500, 3)
    val r = LocalCpi.rwr(g, 0, c, eps)
    assert(Metrics.norm1(r) < 1.0 - 1e-6)
  }

  test("tIter < 0 yields the zero vector") {
    val g = graphs.head._2
    val r = LocalCpi.run(g, LocalCpi.unitSeed(g.n, 0), c, eps, 0, -1)
    assert(r.forall(_ == 0.0))
  }

  test("tIter = 0 yields exactly c·q") {
    val g = graphs.head._2
    val r = LocalCpi.run(g, LocalCpi.unitSeed(g.n, 4), c, eps, 0, 0)
    assert(r(4) === c)
    assert(r.count(_ != 0.0) == 1)
  }

  test("sIter skips early iterations: result orthogonal to family") {
    val g = graphs.head._2
    val q = LocalCpi.unitSeed(g.n, 2)
    val tail = LocalCpi.run(g, q, c, 0.0, 3, 5)
    val expected = math.pow(1 - c, 3) - math.pow(1 - c, 6)
    assert(math.abs(Metrics.norm1(tail) - expected) < 1e-10)
  }

  test("itersToConverge matches the analytic decay") {
    val iters = LocalCpi.itersToConverge(c, 1e-9)
    assert(c * math.pow(1 - c, iters) < 1e-9)
    assert(c * math.pow(1 - c, iters - 2) >= 1e-9)
  }

  test("uniform seed equals averaging unit-seed RWRs (linearity)") {
    val g = TestGraphs.random(40, 200, 9)
    val pr = LocalCpi.pagerank(g, c, eps)
    val avg = new Array[Double](g.n)
    for (s <- 0 until g.n) {
      val r = LocalCpi.rwr(g, s, c, eps)
      for (i <- 0 until g.n) avg(i) += r(i) / g.n
    }
    assert(Metrics.l1(pr, avg) < 1e-7)
  }

  test("restart probability out of range is rejected") {
    val g = graphs.head._2
    intercept[IllegalArgumentException] {
      LocalCpi.run(g, LocalCpi.unitSeed(g.n, 0), 1.5, eps, 0, 10)
    }
  }

  test("seed vector length mismatch is rejected") {
    val g = graphs.head._2
    intercept[IllegalArgumentException] {
      LocalCpi.run(g, new Array[Double](g.n + 1), c, eps, 0, 10)
    }
  }
}
