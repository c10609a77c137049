package repro.metrics

import org.scalatest.funsuite.AnyFunSuite

import repro.{TestFixtures => F}
import repro.linalg.{Hit, TopK}

class RecallSpec extends AnyFunSuite {

  private val ds = F.small

  test("groundTruth matches per-query brute force") {
    val qs = ds.queries.take(4)
    val gt = Recall.groundTruth(ds, qs, 5)
    qs.indices.foreach { i =>
      val direct = TopK.bruteForce(qs(i), ds.ids, ds.data, 5)
      assert(gt(i).map(_.id).toSeq == direct.map(_.id).toSeq)
    }
  }

  test("groundTruth memoizes under a cache key") {
    val qs = ds.queries.take(3)
    val a = Recall.groundTruth(ds, qs, 5, cacheKey = Some("rt"))
    val b = Recall.groundTruth(ds, qs, 5, cacheKey = Some("rt"))
    assert(a eq b)
    Recall.clearCache()
    val c = Recall.groundTruth(ds, qs, 5, cacheKey = Some("rt"))
    assert(!(a eq c))
  }

  test("different k values are cached separately") {
    val qs = ds.queries.take(2)
    val a = Recall.groundTruth(ds, qs, 5, cacheKey = Some("rk"))
    val b = Recall.groundTruth(ds, qs, 7, cacheKey = Some("rk"))
    assert(a(0).length == 5 && b(0).length == 7)
  }

  test("recallAtK of identical lists is 1") {
    val hits = Array(Hit(1, 0.1), Hit(2, 0.2), Hit(3, 0.3))
    assert(Recall.recallAtK(hits, hits, 3) == 1.0)
  }

  test("recallAtK of disjoint lists is 0") {
    val a = Array(Hit(1, 0.1), Hit(2, 0.2))
    val b = Array(Hit(3, 0.1), Hit(4, 0.2))
    assert(Recall.recallAtK(a, b, 2) == 0.0)
  }

  test("recallAtK counts partial overlap") {
    val a = Array(Hit(1, 0.1), Hit(2, 0.2), Hit(9, 0.9), Hit(10, 1.0))
    val b = Array(Hit(1, 0.1), Hit(2, 0.2), Hit(3, 0.3), Hit(4, 0.4))
    assert(Recall.recallAtK(a, b, 4) == 0.5)
  }

  test("recallAtK ignores hits beyond rank k") {
    val a = Array(Hit(1, 0.1), Hit(5, 0.5))
    val b = Array(Hit(1, 0.1), Hit(2, 0.2), Hit(5, 0.5))
    assert(Recall.recallAtK(a, b, 1) == 1.0)
  }

  test("recallAtK with empty truth is 1 (vacuous)") {
    assert(Recall.recallAtK(Array(Hit(1, 0.1)), Array.empty, 3) == 1.0)
  }

  test("meanRecall averages per-query recalls") {
    val perfect = Array(Hit(1, 0.1))
    val wrong = Array(Hit(9, 0.1))
    val truth = Array(Hit(1, 0.1))
    val m = Recall.meanRecall(Array(perfect, wrong), Array(truth, truth), 1)
    assert(m == 0.5)
  }

  test("meanRecall validates alignment and handles empty input") {
    intercept[IllegalArgumentException] {
      Recall.meanRecall(Array(Array(Hit(1, 0.1))), Array.empty, 1)
    }
    assert(Recall.meanRecall(Array.empty, Array.empty, 1) == 1.0)
  }
}
