package repro.core

import org.apache.spark.sql.SparkSession

import repro.ivf.{BuildTimes, IVFIndex}
import repro.linalg.VecOps
import repro.sim.CostParams

/** The paper's `-Mode` parameter. */
sealed trait Mode extends Serializable
object Mode {
  /** adaptive hybrid partitioning chosen by the cost model */
  case object Harmony extends Mode
  /** pure vector-based partitioning (traditional distribution) */
  case object HarmonyVector extends Mode
  /** pure dimension-based partitioning */
  case object HarmonyDimension extends Mode
}

/** System-level configuration mirroring the paper's CLI parameters
  * (`-NMachine`, `-Pruning_Configuration`, `-Indexing_Parameters`, `-α`,
  * `-Mode`) plus the ablation toggles of §6.3.2.
  */
final case class HarmonyConfig(
    nNodes: Int = 4,
    mode: Mode = Mode.Harmony,
    k: Int = 10,
    nprobe: Int = 16,
    pruning: Boolean = true,
    pipeline: Boolean = true,
    /** load-aware placement + rotation; off → naive cluster placement */
    balancedLoad: Boolean = true,
    /** weight of the imbalance term; per-node makespan already prices the
      * bulk of skew, so the default expresses a mild extra skew-aversion */
    alpha: Double = 0.5,
    maxWaves: Int = 4,
    prewarmPerCluster: Int = 4,
    costParams: CostParams = CostParams(),
)

/** A deployed Harmony system: an IVF index laid out on the simulated
  * cluster per the chosen partition plan, ready to serve query batches.
  */
final class HarmonySystem(
    val spark: SparkSession,
    val index: IVFIndex,
    val cfg: HarmonyConfig,
    val plan: PartitionPlan,
    val store: BlockStore,
    val planCost: Option[CostModel.PlanCost],
    val buildTimes: BuildTimes,
) {
  def engineConfig: EngineConfig = EngineConfig(
    k = cfg.k,
    nprobe = cfg.nprobe,
    pruning = cfg.pruning,
    pipeline = cfg.pipeline,
    rotation = if (cfg.balancedLoad) Rotation.LoadAware else Rotation.InOrder,
    maxWaves = cfg.maxWaves,
    prewarmPerCluster = cfg.prewarmPerCluster,
  )

  /** Execute one query batch through the pipelined engine. */
  def search(queries: Array[Array[Float]],
             rotationOverride: Option[Rotation] = None): EngineResult = {
    val ec = rotationOverride.fold(engineConfig)(r => engineConfig.copy(rotation = r))
    Engine.search(spark, store, index, queries, ec, cfg.costParams)
  }

  def shutdown(): Unit = store.unpersist()
}

object Harmony {

  /** Deploy `index` on the simulated cluster.
    *
    * The partition plan is fixed per mode for the two baselines and chosen
    * by the cost model (§4.2) for `Mode.Harmony`, using `workloadSample` to
    * estimate per-cluster probe popularity — the "anticipated workload" of
    * the paper's query-load distribution step.
    */
  def deploy(
      spark: SparkSession,
      index: IVFIndex,
      cfg: HarmonyConfig,
      workloadSample: Array[Array[Float]],
      indexTimes: BuildTimes = BuildTimes(0, 0, 0),
  ): HarmonySystem = {
    val dim = index.dim
    val listSizes = index.listSizes
    val probes = workloadSample.map(q => VecOps.nearestN(q, index.centroids, cfg.nprobe))
    val popularity = CostModel.popularityOf(probes.toSeq, index.nlist)

    val (grid, planCost) = cfg.mode match {
      case Mode.HarmonyVector => ((cfg.nNodes, 1), None)
      case Mode.HarmonyDimension => ((1, cfg.nNodes), None)
      case Mode.Harmony =>
        val survival = CostModel.SurvivalStats.fromData(index, workloadSample, k = cfg.k)
        val c = CostModel.choose(cfg.nNodes, dim, listSizes, popularity,
          nQ = math.max(1, workloadSample.length), nprobe = cfg.nprobe,
          params = cfg.costParams, alpha = cfg.alpha, pruning = cfg.pruning,
          survival = survival)
        ((c.bVec, c.bDim), Some(c))
    }

    val weights = Array.tabulate(index.nlist) { c =>
      // expected candidate rows (popularity-weighted) blended with a
      // uniform-popularity prior: a skewed workload still dominates the
      // placement, but a uniform one degrades to storage balancing instead
      // of amplifying sampling noise into storage imbalance
      (popularity(c) + 1.0 / index.nlist) * listSizes(c)
    }
    val plan = PartitionPlan.build(grid._1, grid._2, dim, weights, balanced = cfg.balancedLoad)
    val store = BlockStore.build(spark, index, plan, samplePerCluster = cfg.prewarmPerCluster)
    val times = indexTimes.copy(preAssignMs = store.preAssignMs)
    new HarmonySystem(spark, index, cfg, plan, store, planCost, times)
  }
}
