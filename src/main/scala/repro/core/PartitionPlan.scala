package repro.core

import org.apache.spark.Partitioner

/** Maps block ids onto simulated nodes — the custom Spark partitioner that
  * realizes Harmony's machine placement. Each Spark partition *is* one
  * machine of the simulated cluster; co-partitioning candidate state with
  * the base-vector blocks is what makes a pipeline stage a local
  * computation plus an explicit (counted) shuffle.
  */
final class NodePartitioner(val nNodes: Int) extends Partitioner {
  require(nNodes > 0, s"nNodes must be positive: $nNodes")
  override def numPartitions: Int = nNodes
  override def getPartition(key: Any): Int = key match {
    case i: Int => ((i % nNodes) + nNodes) % nNodes
    case other  => throw new IllegalArgumentException(s"block keys must be Int, got $other")
  }
  override def equals(o: Any): Boolean = o match {
    case p: NodePartitioner => p.nNodes == nNodes
    case _ => false
  }
  override def hashCode(): Int = nNodes
}

/** A multi-granularity partition plan π (§4.2): a `bVec × bDim` grid.
  *
  *  - `bVec` vector-based shards: each IVF cluster is assigned wholly to one
  *    shard (`shardOfCluster`);
  *  - `bDim` dimension-based slices: near-equal contiguous dimension ranges
  *    `[sliceBounds(s), sliceBounds(s+1))`;
  *  - block (shard `v`, slice `d`) has id `v * bDim + d` and lives on node
  *    `blockId % nNodes`. With `nNodes == bVec * bDim` (the grid layout of
  *    Fig 4) every node holds exactly one block.
  *
  * `bDim = 1` is pure vector-based partitioning, `bVec = 1` pure
  * dimension-based partitioning.
  */
final case class PartitionPlan(
    nNodes: Int,
    bVec: Int,
    bDim: Int,
    dim: Int,
    shardOfCluster: Array[Int],
    sliceBounds: Array[Int],
) extends Serializable {
  require(bVec >= 1 && bDim >= 1, s"degenerate plan ($bVec, $bDim)")
  require(bVec * bDim == nNodes, s"plan grid $bVec x $bDim must equal node count $nNodes")
  require(sliceBounds.length == bDim + 1 && sliceBounds(0) == 0 && sliceBounds(bDim) == dim,
    s"slice bounds must cover [0,$dim): ${sliceBounds.mkString(",")}")
  require(shardOfCluster.forall(s => s >= 0 && s < bVec), "cluster mapped outside shard range")

  def nlist: Int = shardOfCluster.length
  def blockId(shard: Int, slice: Int): Int = shard * bDim + slice
  def nodeOfBlock(id: Int): Int = ((id % nNodes) + nNodes) % nNodes
  def nodeOf(shard: Int, slice: Int): Int = nodeOfBlock(blockId(shard, slice))
  def sliceLo(s: Int): Int = sliceBounds(s)
  def sliceHi(s: Int): Int = sliceBounds(s + 1)
  def sliceLen(s: Int): Int = sliceHi(s) - sliceLo(s)
  def clustersOfShard(shard: Int): Array[Int] =
    shardOfCluster.zipWithIndex.collect { case (s, c) if s == shard => c }

  def partitioner: NodePartitioner = new NodePartitioner(nNodes)
}

object PartitionPlan {

  /** Near-equal contiguous dimension slice boundaries. */
  def dimSlices(dim: Int, bDim: Int): Array[Int] = {
    require(bDim >= 1 && bDim <= dim, s"bDim=$bDim out of range for dim=$dim")
    Array.tabulate(bDim + 1)(s => (s.toLong * dim / bDim).toInt)
  }

  /** Greedy weighted bin packing: clusters in descending weight order onto
    * the currently lightest shard. With `weight = popularity × size` this is
    * the paper's load-aware placement; with `weight = size` it balances
    * storage only.
    */
  def assignShardsWeighted(weights: Array[Double], bVec: Int): Array[Int] = {
    val out = new Array[Int](weights.length)
    val load = new Array[Double](bVec)
    weights.zipWithIndex.sortBy { case (w, c) => (-w, c) }.foreach { case (w, c) =>
      var best = 0
      var i = 1
      while (i < bVec) { if (load(i) < load(best)) best = i; i += 1 }
      out(c) = best
      load(best) += w
    }
    out
  }

  /** Naive placement ignoring sizes and popularity: cluster c → shard c mod
    * bVec (the "traditional" distribution the ablation toggles back to). */
  def assignShardsNaive(nlist: Int, bVec: Int): Array[Int] =
    Array.tabulate(nlist)(_ % bVec)

  /** Build a plan for the grid (bVec, bDim) over nNodes = bVec*bDim. */
  def build(bVec: Int, bDim: Int, dim: Int, clusterWeights: Array[Double],
            balanced: Boolean): PartitionPlan = {
    val nNodes = bVec * bDim
    val shards =
      if (balanced) assignShardsWeighted(clusterWeights, bVec)
      else assignShardsNaive(clusterWeights.length, bVec)
    PartitionPlan(nNodes, bVec, bDim, dim, shards, dimSlices(dim, bDim))
  }

  /** All grid decompositions of nNodes into (bVec, bDim) divisor pairs. */
  def candidateGrids(nNodes: Int, dim: Int): Seq[(Int, Int)] =
    (1 to nNodes).filter(nNodes % _ == 0).map(bv => (bv, nNodes / bv)).filter(_._2 <= dim)
}
