package repro.experiments

/** Experiment parameters (Section IV-A) and feasibility gates.
  *
  * Gates stand in for the paper's "3 hours or 10⁴× TPA" time cap at our
  * scaled-down sizes (DESIGN.md §5): a dense O(n³) method is allowed to
  * run only on analogs corresponding to the datasets it finished on in
  * the paper, and is reported as OOT elsewhere — matching the omitted
  * bars of Figs 1 and 3. Everything is env-overridable so the caps can
  * be lifted for a longer run.
  */
object ExpConfig {
  private def envInt(k: String, d: Int): Int =
    sys.env.get(k).map(_.toInt).getOrElse(d)
  private def envDouble(k: String, d: Double): Double =
    sys.env.get(k).map(_.toDouble).getOrElse(d)

  /** Restart probability (paper: 0.15). */
  val c: Double = envDouble("REPRO_C", 0.15)

  /** CPI convergence tolerance (paper: 1e-9). */
  val eps: Double = envDouble("REPRO_EPS", 1e-9)

  /** Seeds averaged per dataset (paper: 30; default 10 to bound bench time). */
  val numSeeds: Int = envInt("REPRO_SEEDS", 10)

  /** RPPR expansion tolerance (paper: 1e-4). */
  val rpprTheta: Double = envDouble("REPRO_RPPR_THETA", 1e-4)

  /** BRPPR frontier-residual threshold. */
  val brpprKappa: Double = envDouble("REPRO_BRPPR_KAPPA", 1e-3)

  /** NB-LIN target rank (drop tolerance is 0, per the paper). */
  val nbLinRank: Int = envInt("REPRO_NBLIN_RANK", 100)

  /** NB-LIN runs only where n ≤ this (paper: fails from Pokec onward). */
  val nbLinMaxN: Int = envInt("REPRO_NBLIN_MAXN", 3000)

  /** BEAR-APPROX hub fraction for the hubs-last ordering. */
  val bearHubFrac: Double = envDouble("REPRO_BEAR_HUBFRAC", 0.2)

  /** BEAR-APPROX runs only where n ≤ this (paper: fails from Google onward). */
  val bearMaxN: Int = envInt("REPRO_BEAR_MAXN", 1500)

  /** HubPPR backward-push residual bound. */
  val hubPprRmax: Double = envDouble("REPRO_HUBPPR_RMAX", 1e-3)

  /** HubPPR forward-walk count per query. */
  val hubPprWalks: Int = envInt("REPRO_HUBPPR_WALKS", 10000)

  /** HubPPR hub-index size (precomputed backward pushes). */
  val hubPprHubs: Int = envInt("REPRO_HUBPPR_HUBS", 64)

  /** HubPPR full-vector queries run only where n ≤ this (paper: omitted
    * from Google onward — 10⁴× TPA online time).
    */
  val hubPprOnlineMaxN: Int = envInt("REPRO_HUBPPR_ONLINE_MAXN", 1500)

  /** HubPPR seeds for online measurement (full-vector loop is slow by design). */
  val hubPprSeeds: Int = envInt("REPRO_HUBPPR_SEEDS", 3)

  /** Wall-clock cap per HubPPR full-vector query, ms. */
  val hubPprDeadlineMs: Long = envInt("REPRO_HUBPPR_DEADLINE_MS", 120000).toLong
}
