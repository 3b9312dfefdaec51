package repro.bench

import repro.experiments.Experiments
import repro.graph.Datasets

/** Table II: dataset statistics of the scaled-down analogs next to the
  * paper's originals. Asserts each analog keeps its original's edge
  * density (the scaling invariant of DESIGN.md §4).
  */
class TableIIDatasetsBench extends BenchBase {

  test("Table II: analog datasets materialize and keep paper densities") {
    banner("Table II: datasets (analog vs paper)", Experiments.tableII(spark))
    for (spec <- Datasets.all) {
      val m = Datasets.edges(spark, spec).count()
      val density = m.toDouble / spec.n
      val paperDensity = spec.paperEdges.toDouble / spec.paperNodes
      assert(density > paperDensity * 0.6 && density < paperDensity * 1.4,
        s"${spec.name}: density $density vs paper $paperDensity")
      val g = Datasets.local(spark, spec)
      assert((0 until g.n).forall(g.outDeg(_) >= 1), s"${spec.name} has dangling nodes")
    }
  }
}
