package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.exp.Experiments

/** Table 2: dataset statistics (paper scale vs reproduction scale). */
class Table2DatasetStatsBench extends AnyFunSuite {

  test("Table 2: dataset registry") {
    val rows = Experiments.table2()
    println(Experiments.table2Render(rows).render)

    assert(rows.size == 10)
    // paper ordering facts preserved at reproduction scale
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("HandOutlines").reproDim > byName("StarLightCurves").reproDim)
    assert(byName("Sift1B").reproSize >= rows.map(_.reproSize).max)
    assert(rows.forall(r => r.reproSize <= r.paperSize && r.reproQ <= r.paperQ))
  }
}
