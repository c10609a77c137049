package repro.metrics

import scala.collection.concurrent.TrieMap

import repro.linalg.{Hit, Par, TopK}
import repro.vectors.VectorDataset

/** Exact ground truth and recall@K. */
object Recall {

  private val gtCache = TrieMap.empty[String, Array[Array[Hit]]]

  /** Exact top-K for every query by parallel brute force over the base set. */
  def groundTruth(ds: VectorDataset, queries: Array[Array[Float]], k: Int,
                  cacheKey: Option[String] = None): Array[Array[Hit]] = {
    def compute(): Array[Array[Hit]] = {
      val out = new Array[Array[Hit]](queries.length)
      Par.foreachChunk(queries.length, (lo, hi) => {
        var i = lo
        while (i < hi) {
          out(i) = TopK.bruteForce(queries(i), ds.ids, ds.data, k)
          i += 1
        }
      })
      out
    }
    cacheKey match {
      case Some(key) => gtCache.getOrElseUpdate(s"$key#k=$k#q=${queries.length}", compute())
      case None => compute()
    }
  }

  /** recall@K of one result list against its ground truth. */
  def recallAtK(result: Array[Hit], truth: Array[Hit], k: Int): Double = {
    val got = result.take(k).map(_.id).toSet
    val want = truth.take(k).map(_.id).toSet
    if (want.isEmpty) 1.0 else got.intersect(want).size.toDouble / want.size
  }

  /** Mean recall@K over a batch. */
  def meanRecall(results: Array[Array[Hit]], truths: Array[Array[Hit]], k: Int): Double = {
    require(results.length == truths.length, "result/truth count mismatch")
    if (results.isEmpty) 1.0
    else results.indices.map(i => recallAtK(results(i), truths(i), k)).sum / results.length
  }

  def clearCache(): Unit = gtCache.clear()
}
