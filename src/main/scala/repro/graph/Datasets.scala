package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Registry of the paper's 7 evaluation graphs (Table II) and their
  * scaled-down synthetic analogs (see DESIGN.md §4 for the substitution
  * rationale). Each analog is an RMAT graph keeping the original's edge
  * density m/n, with the paper's per-dataset S and T.
  */
final case class DatasetSpec(
    name: String,
    /** log2 of analog node count (RMAT scale). */
    scale: Int,
    /** Target analog edge count before dedup. */
    mTarget: Long,
    /** Starting iteration of the neighbor part (paper Table II). */
    s: Int,
    /** Starting iteration of the stranger part (paper Table II). */
    t: Int,
    /** Node/edge counts of the original KONECT graph, for reporting. */
    paperNodes: Long,
    paperEdges: Long,
    /** Generator seed (fixed per dataset for determinism). */
    seed: Long) {
  def n: Int = 1 << scale
}

object Datasets {

  val slashdot    = DatasetSpec("slashdot-s",    10,    6900L, 4, 15,     82144L,     549202L, 101)
  val google      = DatasetSpec("google-s",      11,   11900L, 4, 40,    875713L,    5105039L, 102)
  val pokec       = DatasetSpec("pokec-s",       13,  153600L, 4, 10,   1632803L,   30622564L, 103)
  val livejournal = DatasetSpec("livejournal-s", 13,  115700L, 4, 10,   4847571L,   68475391L, 104)
  val wikilink    = DatasetSpec("wikilink-s",    14,  509800L, 4,  5,  12150976L,  378142420L, 105)
  val twitter     = DatasetSpec("twitter-s",     15, 1155000L, 2,  5,  41652230L, 1468365182L, 106)
  val friendster  = DatasetSpec("friendster-s",  15, 1239000L, 3, 20,  68349466L, 2586147869L, 107)

  /** All analogs, smallest first (bench iteration order). */
  val all: Seq[DatasetSpec] =
    Seq(slashdot, google, pokec, livejournal, wikilink, twitter, friendster)

  /** The subset small enough for exhaustive per-suite unit testing. */
  val small: Seq[DatasetSpec] = Seq(slashdot, google)

  private val dfCache = scala.collection.mutable.Map.empty[String, DataFrame]
  private val localCache = scala.collection.mutable.Map.empty[String, LocalGraph]

  /** Edge DataFrame of a dataset analog (dangling-patched), cached and
    * persisted for the lifetime of the SparkSession.
    */
  def edges(spark: SparkSession, spec: DatasetSpec): DataFrame = synchronized {
    dfCache.getOrElseUpdate(spec.name, {
      val df = GraphGen.rmatGraph(spark, spec.scale, spec.mTarget, spec.seed)
      df.persist()
      df.count() // materialize once so later uses are stable & fast
      df
    })
  }

  /** Driver-side CSR of a dataset analog, cached. */
  def local(spark: SparkSession, spec: DatasetSpec): LocalGraph = synchronized {
    localCache.getOrElseUpdate(spec.name, LocalGraph.fromDF(edges(spark, spec), spec.n))
  }

  /** Erdős–Rényi counterpart with (approximately) the same n and m as the
    * analog's realized edge count — the Figure 6 "random graph".
    */
  def randomCounterpart(spark: SparkSession, spec: DatasetSpec): DataFrame = synchronized {
    dfCache.getOrElseUpdate(spec.name + "-er", {
      val m = edges(spark, spec).count()
      // ER dedup loses a few draws; oversample 2% to land near m.
      val df = GraphGen.erGraph(spark, spec.n.toLong, (m * 1.02).toLong, spec.seed + 5000)
      df.persist(); df.count(); df
    })
  }

  /** CSR of the random counterpart. */
  def randomCounterpartLocal(spark: SparkSession, spec: DatasetSpec): LocalGraph = synchronized {
    localCache.getOrElseUpdate(spec.name + "-er",
      LocalGraph.fromDF(randomCounterpart(spark, spec), spec.n))
  }

  /** Deterministic sample of `k` seed nodes for a dataset (every node has
    * out-degree ≥ 1 after the dangling patch, so any node is a valid seed).
    */
  def seedNodes(spec: DatasetSpec, k: Int): Seq[Int] = {
    val rng = new scala.util.Random(42 + spec.seed)
    Seq.fill(k)(rng.nextInt(spec.n))
  }
}
