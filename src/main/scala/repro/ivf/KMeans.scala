package repro.ivf

import java.util.Random

import repro.linalg.{Par, VecOps}

/** Lloyd's k-means with k-means++ seeding.
  *
  * All compared systems in the paper share the same clustering (§6.1
  * methodology: "all methods adopt the same clustering algorithm and number
  * of clusters as Faiss"), so a single deterministic trainer feeds Faiss,
  * Harmony-vector, Harmony-dimension and Harmony alike.
  */
object KMeans {

  final case class Result(centroids: Array[Array[Float]], iterations: Int, inertia: Double)

  /** Train `k` centroids on (a sample of) `data`; deterministic in `seed`. */
  def fit(data: Array[Array[Float]], k: Int, maxIter: Int = 10, seed: Long = 17L,
          sampleSize: Int = 20000): Result = {
    require(data.nonEmpty, "empty training data")
    require(k > 0, s"k must be positive: $k")
    val dim = data(0).length
    val sample: Array[Array[Float]] =
      if (data.length <= sampleSize) data
      else {
        val rnd = new Random(seed)
        Array.fill(sampleSize)(data(rnd.nextInt(data.length)))
      }
    val kk = math.min(k, sample.length)
    var centroids = seedPlusPlus(sample, kk, seed)

    var iter = 0
    var inertia = Double.MaxValue
    var converged = false
    while (iter < maxIter && !converged) {
      val assign = assignAll(sample, centroids)
      val sums = Array.ofDim[Double](kk, dim)
      val counts = new Array[Long](kk)
      var newInertia = 0.0
      var i = 0
      while (i < sample.length) {
        val c = assign(i)
        val v = sample(i)
        var j = 0
        while (j < dim) { sums(c)(j) += v(j); j += 1 }
        counts(c) += 1
        newInertia += VecOps.l2(v, centroids(c))
        i += 1
      }
      val next = Array.tabulate(kk) { c =>
        if (counts(c) == 0) centroids(c) // keep empty-cluster centroid
        else Array.tabulate(dim)(j => (sums(c)(j) / counts(c)).toFloat)
      }
      converged = math.abs(inertia - newInertia) < 1e-6 * math.max(1.0, inertia)
      inertia = newInertia
      centroids = next
      iter += 1
    }
    Result(centroids, iter, inertia)
  }

  /** Assign every vector to its nearest centroid (parallel over points). */
  def assignAll(data: Array[Array[Float]], centroids: Array[Array[Float]]): Array[Int] = {
    val out = new Array[Int](data.length)
    Par.foreachChunk(data.length, (lo, hi) => {
      var i = lo
      while (i < hi) { out(i) = VecOps.nearest(data(i), centroids); i += 1 }
    })
    out
  }

  /** k-means++ seeding, deterministic in the seed. */
  private def seedPlusPlus(data: Array[Array[Float]], k: Int, seed: Long): Array[Array[Float]] = {
    val rnd = new Random(seed)
    val centroids = new Array[Array[Float]](k)
    centroids(0) = data(rnd.nextInt(data.length))
    val minD = Array.fill(data.length)(Double.MaxValue)
    var c = 1
    while (c < k) {
      val prev = centroids(c - 1)
      Par.foreachChunk(data.length, (lo, hi) => {
        var i = lo
        while (i < hi) {
          val d = VecOps.l2(data(i), prev)
          if (d < minD(i)) minD(i) = d
          i += 1
        }
      })
      val total = minD.sum
      val target = rnd.nextDouble() * total
      var acc = 0.0
      var pick = 0
      var i = 0
      var found = false
      while (i < data.length && !found) {
        acc += minD(i)
        if (acc >= target) { pick = i; found = true }
        i += 1
      }
      centroids(c) = data(pick)
      c += 1
    }
    centroids
  }
}
