package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.vectors.Datasets

/** Fig 10: index build time breakdown (Train / Add / Pre-assign).
  *
  * Paper: Train and Add are method-independent (shared clustering, good
  * scalability); Pre-assign exists only for distributed methods and is
  * longer for dimension-splitting layouts (they allocate and initialize
  * partial-distance intermediates); Train/Add scale with dims × size.
  */
class Fig10BuildTimeBench extends SparkSpec {

  test("Fig 10: index build breakdown across methods") {
    val rows = Experiments.fig10(spark, Datasets.small8)
    println(Experiments.fig10Render(rows).render)

    Datasets.small8.map(_.name).foreach { name =>
      val m = rows.filter(_.name == name).map(r => r.method -> r).toMap
      // shared clustering → identical Train/Add across all four methods
      assert(m.values.map(r => (r.trainMs, r.addMs)).toSet.size == 1, name)
      assert(m("Faiss").preAssignMs == 0, name)
      Seq("Vector", "Dimension", "Harmony").foreach { meth =>
        assert(m(meth).preAssignMs >= 0, s"$name/$meth")
      }
    }

    // pre-assign work scales with data volume: the largest dataset takes
    // longer to lay out than the smallest (wall-clock; generous ordering)
    def pre(name: String): Long =
      rows.filter(r => r.name == name && r.method != "Faiss").map(_.preAssignMs).max
    assert(pre("Glove2.2m") + 5 >= pre("Deep1M") / 4,
      s"glove2.2m ${pre("Glove2.2m")}ms vs deep1m ${pre("Deep1M")}ms")
  }
}
