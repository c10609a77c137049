package repro.core

import repro.{SparkSpec, TestFixtures => F}

class BlockStoreSpec extends SparkSpec {

  private lazy val (idx, _) = F.index(spark, F.small)

  private def store(bVec: Int, bDim: Int): BlockStore = {
    val plan = PartitionPlan.build(bVec, bDim, idx.dim,
      idx.listSizes.map(_.toDouble), balanced = true)
    BlockStore.build(spark, idx, plan)
  }

  test("blocks RDD has one partition per node and correct placement") {
    val st = store(2, 2)
    try {
      assert(st.blocks.getNumPartitions == 4)
      val placed = st.blocks.mapPartitionsWithIndex { (node, it) =>
        it.map { case (bid, _) => (node, bid) }
      }.collect()
      placed.foreach { case (node, bid) => assert(st.plan.nodeOfBlock(bid) == node) }
      assert(placed.length == 4) // one block per node in the grid layout
    } finally st.unpersist()
  }

  test("shard layouts cover all clusters disjointly") {
    val st = store(4, 1)
    try {
      val clusters = st.layouts.flatMap(_.clusters)
      assert(clusters.sorted.toSeq == (0 until idx.nlist))
      assert(st.layouts.map(_.nRows.toLong).sum == idx.nTotal)
    } finally st.unpersist()
  }

  test("shard row ids are the concatenated cluster lists") {
    val st = store(2, 2)
    try {
      st.layouts.foreach { l =>
        l.clusters.zipWithIndex.foreach { case (c, i) =>
          val (lo, hi) = l.rangeOfCluster(c).get
          assert(hi - lo == idx.listSize(c))
          assert(l.rowIds.slice(lo, hi).toSeq == idx.listIds(c).toSeq)
          assert(lo == l.clusterRowStart(i))
        }
      }
    } finally st.unpersist()
  }

  test("rangeOfCluster is None for clusters of other shards") {
    val st = store(4, 1)
    try {
      val l0 = st.layouts(0)
      val foreign = (0 until idx.nlist).find(c => st.plan.shardOfCluster(c) != 0).get
      assert(l0.rangeOfCluster(foreign).isEmpty)
    } finally st.unpersist()
  }

  test("block payloads hold the exact slice of each stored vector") {
    val st = store(2, 2)
    try {
      val blocks = st.blocks.collect().toMap
      val plan = st.plan
      for (shard <- 0 until 2; slice <- 0 until 2) {
        val block = blocks(plan.blockId(shard, slice))
        val layout = st.layouts(shard)
        assert(block.nRows == layout.nRows)
        // spot-check first rows of first cluster
        val c = layout.clusters(0)
        val id = idx.listIds(c)(0).toInt
        val lo = plan.sliceLo(slice)
        (0 until plan.sliceLen(slice)).foreach { j =>
          assert(block.data(j) == F.small.data(id)(lo + j))
        }
      }
    } finally st.unpersist()
  }

  test("total payload across blocks equals the raw dataset payload") {
    val st = store(2, 2)
    try {
      val total = st.blocks.collect().map(_._2.payloadBytes).sum
      assert(total == F.small.dataBytes)
      assert(st.totalPayloadBytes == F.small.dataBytes)
    } finally st.unpersist()
  }

  test("per-node storage: distributed plans use ~1/nNodes of single-node payload") {
    val st = store(2, 2)
    try {
      val perNode = st.perNodeStorageBytes
      assert(perNode.length == 4)
      val maxNode = perNode.max
      assert(maxNode < idx.sizeBytes / 2, s"node bytes $maxNode vs faiss ${idx.sizeBytes}")
      assert(maxNode >= F.small.dataBytes / 4, "node must hold at least its payload share")
    } finally st.unpersist()
  }

  test("dimension plans carry a small accumulator overhead, vector plans none") {
    val sv = store(4, 1)
    val sd = store(1, 4)
    try {
      val vMax = sv.perNodeStorageBytes.max
      val dMax = sd.perNodeStorageBytes.max
      assert(dMax > vMax, s"dim $dMax !> vec $vMax")
      // overhead stays small (paper: ~2%; generous bound here)
      assert(dMax.toDouble / vMax < 1.35, s"overhead ratio ${dMax.toDouble / vMax}")
    } finally { sv.unpersist(); sd.unpersist() }
  }

  test("prewarm samples are genuine members of their clusters") {
    val st = store(2, 2)
    try {
      (0 until idx.nlist).foreach { c =>
        st.sampleIds(c).zipWithIndex.foreach { case (id, j) =>
          assert(idx.listIds(c).contains(id))
          assert(st.sampleVecs(c)(j).sameElements(F.small.data(id.toInt)))
        }
      }
    } finally st.unpersist()
  }

  test("pre-assign time is measured") {
    val st = store(2, 2)
    try assert(st.preAssignMs >= 0) finally st.unpersist()
  }

  test("build rejects a plan with mismatched cluster count") {
    val plan = PartitionPlan.build(2, 2, idx.dim, Array.fill(idx.nlist + 1)(1.0), balanced = true)
    intercept[IllegalArgumentException](BlockStore.build(spark, idx, plan))
  }
}
