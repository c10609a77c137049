package repro.core

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import org.apache.spark.storage.StorageLevel

import repro.ivf.IVFIndex

/** Row layout of one vector shard: the clusters it owns, concatenated in
  * order. `clusterRowStart(i)` is the first row of `clusters(i)`;
  * `rowIds(r)` is the vector id of shard row `r`. All dimension slices of a
  * shard share this layout, which is what lets a partial-distance
  * accumulator indexed by shard row travel between machines.
  */
final case class ShardLayout(
    shard: Int,
    clusters: Array[Int],
    clusterRowStart: Array[Int],
    rowIds: Array[Long],
) extends Serializable {
  require(clusterRowStart.length == clusters.length + 1)
  def nRows: Int = rowIds.length
  def rangeOfCluster(c: Int): Option[(Int, Int)] = {
    val i = clusters.indexOf(c)
    if (i < 0) None else Some((clusterRowStart(i), clusterRowStart(i + 1)))
  }
}

/** The payload of one grid block (shard × dimension slice): `nRows × sliceLen`
  * floats, row-major, rows ordered per the shard layout.
  */
final case class BlockData(
    shard: Int,
    slice: Int,
    sliceLo: Int,
    sliceLen: Int,
    data: Array[Float],
) extends Serializable {
  def nRows: Int = if (sliceLen == 0) 0 else data.length / sliceLen
  def payloadBytes: Long = data.length.toLong * 4L
}

/** Distributed base-vector store for a partition plan: an
  * `RDD[(blockId, BlockData)]` partitioned by [[NodePartitioner]] so each
  * simulated node materializes exactly its blocks, plus client-side routing
  * state (centroids come from the IVF index; a small per-cluster sample
  * feeds the prewarm heap).
  */
final class BlockStore(
    val plan: PartitionPlan,
    val layouts: Array[ShardLayout],
    val blocks: RDD[(Int, BlockData)],
    val bcLayouts: Broadcast[Array[ShardLayout]],
    /** per-cluster prewarm sample: ids and full-dimension vectors */
    val sampleIds: Array[Array[Long]],
    val sampleVecs: Array[Array[Array[Float]]],
    val preAssignMs: Long,
) extends Serializable {

  /** Storage bytes per node: block payloads + the slice-spread id share +
    * (for dimension-split plans) the per-row partial-accumulator buffers the
    * pre-assign stage allocates — the small overhead Table 4 observes for
    * dimension-based methods.
    */
  def perNodeStorageBytes: Array[Long] = {
    val bytes = new Array[Long](plan.nNodes)
    for (shard <- 0 until plan.bVec; slice <- 0 until plan.bDim) {
      val node = plan.nodeOf(shard, slice)
      val rows = layouts(shard).nRows.toLong
      val payload = rows * plan.sliceLen(slice) * 4L
      val idShare = rows * 8L / plan.bDim
      val partialBuf = if (plan.bDim > 1) rows * 8L else 0L
      val offsets = layouts(shard).clusters.length.toLong * 8L
      bytes(node) += payload + idShare + partialBuf + offsets
    }
    bytes
  }

  def maxNodeStorageBytes: Long = perNodeStorageBytes.max
  def totalPayloadBytes: Long =
    layouts.map(l => l.nRows.toLong * plan.dim * 4L).sum

  def unpersist(): Unit = {
    blocks.unpersist(blocking = false)
    bcLayouts.destroy()
  }
}

object BlockStore {

  /** Lay the IVF index out on the simulated cluster per `plan` (the paper's
    * Pre-assign build stage, timed).
    */
  def build(spark: SparkSession, index: IVFIndex, plan: PartitionPlan,
            samplePerCluster: Int = 4): BlockStore = {
    require(plan.nlist == index.nlist, s"plan has ${plan.nlist} clusters, index ${index.nlist}")
    val t0 = System.nanoTime()
    val dim = index.dim

    val layouts = Array.tabulate(plan.bVec) { shard =>
      val clusters = plan.clustersOfShard(shard)
      val starts = new Array[Int](clusters.length + 1)
      var acc = 0
      clusters.zipWithIndex.foreach { case (c, i) => starts(i) = acc; acc += index.listSize(c) }
      starts(clusters.length) = acc
      val rowIds = new Array[Long](acc)
      clusters.zipWithIndex.foreach { case (c, i) =>
        System.arraycopy(index.listIds(c), 0, rowIds, starts(i), index.listSize(c))
      }
      ShardLayout(shard, clusters, starts, rowIds)
    }

    val blockSeq: Seq[(Int, BlockData)] =
      for (shard <- 0 until plan.bVec; slice <- 0 until plan.bDim) yield {
        val layout = layouts(shard)
        val lo = plan.sliceLo(slice)
        val len = plan.sliceLen(slice)
        val data = new Array[Float](layout.nRows * len)
        var rowBase = 0
        layout.clusters.foreach { c =>
          val rows = index.listSize(c)
          val src = index.listData(c)
          var r = 0
          while (r < rows) {
            System.arraycopy(src, r * dim + lo, data, (rowBase + r) * len, len)
            r += 1
          }
          rowBase += rows
        }
        (plan.blockId(shard, slice), BlockData(shard, slice, lo, len, data))
      }

    val sc = spark.sparkContext
    val blocks = sc
      .parallelize(blockSeq, plan.nNodes)
      .partitionBy(plan.partitioner)
      .persist(StorageLevel.MEMORY_ONLY)
    blocks.count() // materialize: placement is part of pre-assign time

    val bcLayouts = sc.broadcast(layouts)

    // deterministic per-cluster prewarm sample (first rows of each list)
    val sampleIds = Array.tabulate(index.nlist)(c =>
      index.listIds(c).take(samplePerCluster))
    val sampleVecs = Array.tabulate(index.nlist) { c =>
      val m = math.min(samplePerCluster, index.listSize(c))
      Array.tabulate(m) { r =>
        val v = new Array[Float](dim)
        System.arraycopy(index.listData(c), r * dim, v, 0, dim)
        v
      }
    }

    val preAssignMs = (System.nanoTime() - t0) / 1000000L
    new BlockStore(plan, layouts, blocks, bcLayouts, sampleIds, sampleVecs, preAssignMs)
  }
}
