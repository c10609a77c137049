package repro.jobs

import repro.core._
import repro.exp.Experiments
import repro.sim.CostParams
import repro.vectors.Datasets

/** Diagnostic: engine-measured QPS for every grid, vs single-node Faiss. */
object GridDebug {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("grid-debug")
    try {
      Seq(Datasets.sift1m, Datasets.starLightCurves, Datasets.glove1_2m, Datasets.msong).foreach { cfg =>
        val (ds, idx, _) = Experiments.indexed(spark, cfg)
        val faiss = repro.baselines.Faiss.run(idx, ds.queries, 10, 16, CostParams())
        val line = PartitionPlan.candidateGrids(4, idx.dim).map { case (bv, bd) =>
          val plan = PartitionPlan.build(bv, bd, idx.dim, idx.listSizes.map(_.toDouble), balanced = true)
          val store = BlockStore.build(spark, idx, plan)
          try {
            val r = Engine.search(spark, store, idx, ds.queries,
              EngineConfig(k = 10, nprobe = 16), CostParams())
            f"($bv,$bd): x${r.report.qps / faiss.report.qps}%5.2f [c${r.report.compSeconds * 1000}%5.1f m${r.report.commSeconds * 1000}%5.1f o${r.report.otherSeconds * 1000}%4.1f]"
          } finally store.unpersist()
        }.mkString(" ")
        println(f"${cfg.name}%-16s faiss=${faiss.report.totalSeconds * 1000}%6.1fms $line")
      }
    } finally spark.stop()
  }
}
