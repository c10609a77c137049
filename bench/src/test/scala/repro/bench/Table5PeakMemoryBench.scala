package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.vectors.Datasets

/** Table 5: peak per-node memory during query execution.
  *
  * Paper: Harmony-vector < Harmony < Harmony-dimension; the dimension-split
  * overhead comes from partial-state intermediates and shrinks relative to
  * the index as dimensionality grows (Deep1M +30.9% → HandOutlines +1.17%).
  */
class Table5PeakMemoryBench extends SparkSpec {

  test("Table 5: peak per-node query memory (4 nodes)") {
    val rows = Experiments.table5(spark, Datasets.small8)
    println(Experiments.table5Render(rows).render)

    rows.foreach { r =>
      assert(r.vector > 0 && r.harmony > 0 && r.dimension > 0, r.name)
      assert(r.dimension >= r.vector, s"${r.name}: dim ${r.dimension} < vec ${r.vector}")
      assert(r.harmony <= r.dimension * 12 / 10, s"${r.name}: harmony far above dimension")
    }

    // the relative dimension-split overhead shrinks as dims grow
    def rel(name: String): Double = {
      val r = rows.find(_.name == name).get
      (r.dimension - r.vector).toDouble / r.vector
    }
    assert(rel("HandOutlines") < rel("Word2vec"),
      s"hand ${rel("HandOutlines")} !< w2v ${rel("Word2vec")}")
  }
}
