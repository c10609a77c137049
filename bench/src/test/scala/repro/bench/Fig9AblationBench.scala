package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.vectors.Datasets

/** Fig 9: contribution of the three optimization techniques.
  *
  * Paper (4 nodes): balanced load 1.75×, pipeline + async execution 1.25×,
  * pruning 1.51× average throughput gains; gains are muted on datasets
  * whose load is already uniform (their Sift1M), pruning stays robust.
  */
class Fig9AblationBench extends SparkSpec {

  test("Fig 9: optimization technique contributions (4 nodes, moderate skew)") {
    val rows = Experiments.fig9(spark, Datasets.small8, skewLevel = 0.6)
    println(Experiments.fig9Render(rows).render)

    def avg(f: Experiments.F9Row => Double): Double = rows.map(f).sum / rows.size

    // each technique contributes on average (ratios full/without-X)
    assert(avg(_.balancedGain) > 1.02, s"balanced-load gain ${avg(_.balancedGain)}")
    assert(avg(_.pipelineGain) > 1.02, s"pipeline gain ${avg(_.pipelineGain)}")
    assert(avg(_.pruningGain) > 1.05, s"pruning gain ${avg(_.pruningGain)}")

    // no ablation should *help* by a large margin on any dataset
    rows.foreach { r =>
      assert(r.balancedGain > 0.8, s"${r.name} balanced ${r.balancedGain}")
      assert(r.pipelineGain > 0.8, s"${r.name} pipeline ${r.pipelineGain}")
      assert(r.pruningGain > 0.8, s"${r.name} pruning ${r.pruningGain}")
    }

    // pruning matters most where the planner chose dimension splits — at
    // least one dataset gains substantially from it (the paper's 1.51× is
    // an average over a system that splits dimensions on every dataset;
    // our planner keeps the extreme time-series sets on pure vector grids,
    // where dimension-level pruning cannot apply — see EXPERIMENTS.md)
    assert(rows.map(_.pruningGain).max > 1.2,
      s"max pruning gain ${rows.map(_.pruningGain).max}")
  }
}
