package repro.baselines

import repro.graph.LocalGraph

/** Classic power iteration (Section II-C) — the exact method CPI is
  * proven equivalent to in Theorem 1. Kept as an independent
  * implementation so tests can cross-check `r_CPI = r_PI` without the
  * two sharing code.
  */
object PowerIteration {

  /** Solve `r = (1-c) Ã^T r + c q` by fixed-point iteration until the
    * L1 change between successive iterates drops below `eps`.
    */
  def solve(g: LocalGraph, q: Array[Double], c: Double, eps: Double,
            maxIter: Int = 10000): Array[Double] = {
    require(q.length == g.n, "seed vector length mismatch")
    var r = q.map(_ * c)
    var iter = 0
    var delta = Double.MaxValue
    while (delta >= eps && iter < maxIter) {
      val nr = new Array[Double](g.n)
      var u = 0
      while (u < g.n) {
        val ru = r(u)
        if (ru != 0.0) {
          val d = g.outDeg(u)
          if (d > 0) {
            val share = ru * (1.0 - c) / d
            var j = g.offsets(u)
            val end = g.offsets(u + 1)
            while (j < end) { nr(g.targets(j)) += share; j += 1 }
          }
        }
        u += 1
      }
      var i = 0
      while (i < g.n) { nr(i) += c * q(i); i += 1 }
      delta = 0.0
      i = 0
      while (i < g.n) { delta += math.abs(nr(i) - r(i)); i += 1 }
      r = nr
      iter += 1
    }
    r
  }

  /** Exact RWR from seed `s` via power iteration. */
  def rwr(g: LocalGraph, s: Int, c: Double, eps: Double = 1e-12): Array[Double] = {
    val q = new Array[Double](g.n); q(s) = 1.0
    solve(g, q, c, eps)
  }
}
