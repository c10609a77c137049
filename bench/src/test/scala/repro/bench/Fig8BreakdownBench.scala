package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.vectors.Datasets

/** Fig 8 (and Fig 2b): time breakdown into computation / communication /
  * other.
  *
  * Paper: Harmony-vector has (near) zero inter-node communication;
  * Harmony-dimension communicates most (more dimension slicing); Harmony
  * sits between; communication matters less as dimensionality grows
  * (Sift1M's comm share ≫ Msong's).
  */
class Fig8BreakdownBench extends SparkSpec {

  test("Fig 8: simulated time breakdown per mode (4 nodes)") {
    val rows = Experiments.fig8(spark, Datasets.small8)
    println(Experiments.fig8Render(rows).render)

    def commShare(r: Experiments.F8Row): Double =
      r.commSec / (r.compSec + r.commSec + r.otherSec)

    Datasets.small8.map(_.name).foreach { name =>
      val m = rows.filter(_.name == name).map(r => r.mode -> r).toMap
      val v = m("Harmony-vector"); val d = m("Harmony-dimension"); val h = m("Harmony")
      assert(commShare(v) <= commShare(d) + 1e-9, s"$name: vector comm above dimension")
      assert(commShare(h) <= commShare(d) + 1e-9, s"$name: harmony comm above dimension")
      assert(v.compSec > 0 && d.compSec > 0 && h.compSec > 0, name)
    }

    // comm share of the dimension mode shrinks as dimensionality grows
    def dimCommShare(name: String): Double =
      commShare(rows.find(r => r.name == name && r.mode == "Harmony-dimension").get)
    assert(dimCommShare("HandOutlines") < dimCommShare("Sift1M"),
      s"hand ${dimCommShare("HandOutlines")} !< sift ${dimCommShare("Sift1M")}")
  }
}
