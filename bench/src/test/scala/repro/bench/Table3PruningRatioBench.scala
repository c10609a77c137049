package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.vectors.Datasets

/** Table 3: average pruning ratio per dimension slice across four nodes.
  *
  * Paper values (for EXPERIMENTS.md): second-slice avg 33.61%, third-slice
  * avg 66.15%, fourth-slice avg 92.33%; Star prunes most (69.14% avg),
  * GloVe least (≈29.7% avg); final slice consistently > 80%.
  */
class Table3PruningRatioBench extends SparkSpec {

  test("Table 3: pruning ratio per slice (4 nodes, Bdim = 4)") {
    val rows = Experiments.table3(spark, Datasets.small8)
    println(Experiments.table3Render(rows).render)

    val byName = rows.map(r => r.name -> r).toMap

    // first slice can never be pruned; ratios grow along the pipeline
    rows.foreach { r =>
      assert(r.ratios.head == 0.0, r.name)
      r.ratios.toSeq.sliding(2).foreach(w => assert(w(1) >= w(0) - 1e-12, r.name))
    }

    // later slices prune hard on average (paper: 33.6 / 66.2 / 92.3)
    def sliceAvg(i: Int): Double = rows.map(_.ratios(i)).sum / rows.size
    assert(sliceAvg(1) > 0.10, s"second-slice avg ${sliceAvg(1)}")
    assert(sliceAvg(2) > sliceAvg(1))
    assert(sliceAvg(3) > sliceAvg(2))
    assert(sliceAvg(3) > 0.50, s"fourth-slice avg ${sliceAvg(3)}")

    // dataset ordering: time-series (energy-decayed) sets prune far better
    // than GloVe-like isotropic text sets
    assert(byName("StarLightCurves").avg > byName("Glove1.2m").avg)
    assert(byName("HandOutlines").avg > byName("Glove2.2m").avg)
    assert(byName("StarLightCurves").ratios(1) > 0.5) // paper: 81.24
    assert(byName("Glove1.2m").ratios(1) < 0.5)       // paper: 1.54
  }
}
