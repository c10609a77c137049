package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.vectors.Datasets

/** Fig 11: (a) speedup vs dimensionality and dataset size on Gaussian data;
  * (b) node-count scalability.
  *
  * Paper: speedup grows ≈26.8% per dimension doubling and ≈25.9% per size
  * doubling; large/high-dim settings exceed the machine count (pruning);
  * small datasets are communication-bound and suboptimal. Scalability:
  * Harmony super-linear, vector ≈ linear, dimension rises then declines.
  */
class Fig11ScalingBench extends SparkSpec {

  test("Fig 11a: Harmony speedup vs dims and size (Gaussian, 4 nodes)") {
    val dims = Seq(64, 128, 256, 512)
    val sizes = Seq(25000, 50000, 100000)
    val rows = Experiments.fig11a(spark, dims, sizes)
    println(Experiments.fig11aRender(rows).render)

    def sp(dim: Int, size: Int): Double =
      rows.find(r => r.dim == dim && r.size == size).get.harmonySpeedup

    // speedup grows with dimensionality at fixed size
    assert(sp(512, 100000) > sp(64, 100000),
      s"512d ${sp(512, 100000)} !> 64d ${sp(64, 100000)}")
    // speedup grows with dataset size at fixed dim
    assert(sp(256, 100000) > sp(256, 25000),
      s"100k ${sp(256, 100000)} !> 25k ${sp(256, 25000)}")
    // the large, high-dimensional corner beats the machine count (pruning)
    assert(sp(512, 100000) > 4.0, s"corner speedup ${sp(512, 100000)}")
    assert(rows.forall(_.harmonySpeedup > 0.5))
  }

  test("Fig 11b: node scalability on Sift1M (4/8/16 nodes)") {
    val rows = Experiments.fig11b(spark, Datasets.sift1m, Seq(4, 8, 16))
    println(Experiments.fig11bRender("Sift1M", rows).render)

    val by = rows.map(r => r.nNodes -> r).toMap
    // vector partitioning scales with the worker count
    assert(by(16).vectorX > by(4).vectorX)
    assert(by(8).vectorX > 0.5 * 8 && by(8).vectorX < 1.5 * 8,
      s"vector x${by(8).vectorX} at 8 nodes")
    // Harmony keeps scaling too
    assert(by(16).harmonyX > by(4).harmonyX)
    // dimension partitioning's scaling flattens relative to vector at high
    // node counts (communication grows with the split count)
    val dimEff16 = by(16).dimensionX / 16
    val dimEff4 = by(4).dimensionX / 4
    assert(dimEff16 < dimEff4, s"dimension efficiency rose: $dimEff4 -> $dimEff16")
  }
}
