package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.vectors.Datasets

/** Table 4: per-node index memory, Faiss vs the three partitionings.
  *
  * Paper: all three distributed schemes take ≈¼ of the single-machine Faiss
  * index per node (4 nodes, no replication); dimension-involving schemes add
  * only ≈2% overhead.
  */
class Table4IndexMemoryBench extends SparkSpec {

  test("Table 4: index memory per node (4 nodes)") {
    val rows = Experiments.table4(spark, Datasets.small8)
    println(Experiments.table4Render(rows).render)

    rows.foreach { r =>
      // ≈ 1/4 of the single-node index per node (allow packing slack)
      assert(r.vector < 0.45 * r.faiss, s"${r.name}: vector ${r.vector} vs faiss ${r.faiss}")
      assert(r.vector > 0.15 * r.faiss, s"${r.name}: vector suspiciously small")
      // dimension-based layouts pay a small accumulator/offset overhead
      assert(r.dimension >= r.vector, r.name)
      // a hybrid (2,2) grid can exceed the perfectly-sliced (1,4) max-node
      // bytes slightly when its two shards pack unevenly
      assert(r.harmony <= (math.max(r.dimension, r.vector) * 1.15).toLong, r.name)
      val overhead = (r.dimension - r.vector).toDouble / r.vector
      assert(overhead < 0.12, s"${r.name}: dimension overhead ${overhead}")
    }

    // memory ordering follows dataset payload (size × dim), as in the paper
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("HandOutlines").faiss > byName("Sift1M").faiss)
    assert(byName("StarLightCurves").faiss > byName("Deep1M").faiss)
  }
}
