package repro.integration

import repro.{SparkSpec, TestFixtures => F}
import repro.baselines.Faiss
import repro.core.{Harmony, HarmonyConfig, Mode}
import repro.metrics.Recall
import repro.sim.CostParams
import repro.vectors.Workloads

/** End-to-end behavioural properties — the paper's headline claims at test
  * scale: distributed speedup over Faiss, stability of dimension/hybrid
  * partitioning under skew, and vector partitioning's skew collapse.
  */
class EndToEndSpec extends SparkSpec {

  private lazy val (idx, _) = F.index(spark, F.small)
  private val k = 10
  private val nprobe = 8

  private def run(mode: Mode, queries: Array[Array[Float]],
                  pruning: Boolean = true, alpha: Double = 2.0): repro.sim.SimReport = {
    val sys = Harmony.deploy(spark, idx,
      HarmonyConfig(nNodes = 4, mode = mode, k = k, nprobe = nprobe,
        pruning = pruning, alpha = alpha),
      workloadSample = if (mode == Mode.Harmony) queries else Array.empty)
    try sys.search(queries).report finally sys.shutdown()
  }

  private def qps(mode: Mode, queries: Array[Array[Float]],
                  pruning: Boolean = true, alpha: Double = 2.0): Double =
    run(mode, queries, pruning, alpha).qps

  /** cluster utilization — workload-volume-independent degradation metric */
  private def opsRate(mode: Mode, queries: Array[Array[Float]]): Double = {
    val r = run(mode, queries)
    r.totalDimOps / r.totalSeconds
  }

  private lazy val faissQps =
    Faiss.run(idx, F.small.queries, k, nprobe, CostParams()).report.qps

  test("vector and harmony modes beat single-node Faiss under uniform load") {
    // note: dimension mode is communication-bound at this tiny 32-dim test
    // scale (the paper's Fig 11a observes the same for small datasets), so
    // only the comm-light modes must win here; bench scale covers the rest.
    for (mode <- Seq(Mode.HarmonyVector, Mode.Harmony)) {
      val q = qps(mode, F.small.queries)
      assert(q > 1.3 * faissQps, s"$mode qps $q vs faiss $faissQps")
    }
  }

  test("dimension mode stays within a sane band of Faiss at tiny scale") {
    val q = qps(Mode.HarmonyDimension, F.small.queries)
    assert(q > 0.3 * faissQps, s"dimension qps $q vs faiss $faissQps")
  }

  test("distributed speedup is in a plausible band (not super-linear absurd)") {
    for (mode <- Seq(Mode.HarmonyVector, Mode.Harmony)) {
      val q = qps(mode, F.small.queries)
      assert(q < 40 * faissQps, s"$mode qps $q vs faiss $faissQps")
    }
  }

  private lazy val skewed =
    repro.exp.Experiments.adversarialQueries(idx, F.small, 4, F.smallCfg.nQueries, 1.0,
      nprobe = nprobe)
  private lazy val uniformAdv =
    repro.exp.Experiments.adversarialQueries(idx, F.small, 4, F.smallCfg.nQueries, 0.0,
      nprobe = nprobe)

  test("vector partitioning's utilization collapses under extreme skew") {
    val uni = opsRate(Mode.HarmonyVector, uniformAdv)
    val skew = opsRate(Mode.HarmonyVector, skewed)
    assert(skew < 0.75 * uni, s"skewed rate $skew vs uniform rate $uni")
  }

  test("dimension partitioning's utilization is stable under skew") {
    val uni = opsRate(Mode.HarmonyDimension, uniformAdv)
    val skew = opsRate(Mode.HarmonyDimension, skewed)
    assert(skew > 0.6 * uni, s"skewed rate $skew vs uniform rate $uni")
  }

  test("harmony is at least competitive with both baselines under skew") {
    val h = qps(Mode.Harmony, skewed, alpha = 3.0)
    val v = qps(Mode.HarmonyVector, skewed)
    val d = qps(Mode.HarmonyDimension, skewed)
    assert(h > 0.8 * math.max(v, d), s"harmony $h vs vector $v, dimension $d")
  }

  test("pruning increases throughput on prunable data") {
    val (idxDec, _) = F.index(spark, F.decay)
    def q(pruning: Boolean): Double = {
      val sys = Harmony.deploy(spark, idxDec,
        HarmonyConfig(nNodes = 4, mode = Mode.HarmonyDimension, k = k, nprobe = nprobe,
          pruning = pruning),
        Array.empty)
      try sys.search(F.decay.queries).report.qps finally sys.shutdown()
    }
    assert(q(true) > q(false))
  }

  test("recall is governed by nprobe, identically across modes") {
    val truths = Recall.groundTruth(F.small, F.small.queries, k, Some("e2e"))
    def recall(mode: Mode): Double = {
      val sys = Harmony.deploy(spark, idx,
        HarmonyConfig(nNodes = 4, mode = mode, k = k, nprobe = nprobe), Array.empty)
      try Recall.meanRecall(sys.search(F.small.queries).hits, truths, k)
      finally sys.shutdown()
    }
    val rs = Seq(Mode.HarmonyVector, Mode.HarmonyDimension, Mode.Harmony).map(recall)
    val rf = Recall.meanRecall(
      Faiss.run(idx, F.small.queries, k, nprobe, CostParams()).hits, truths, k)
    rs.foreach(r => assert(math.abs(r - rf) < 1e-9, s"recalls $rs vs faiss $rf"))
    assert(rf > 0.85)
  }

  test("higher nprobe trades QPS for recall") {
    val truths = Recall.groundTruth(F.small, F.small.queries, k, Some("e2e"))
    def run(np: Int): (Double, Double) = {
      val sys = Harmony.deploy(spark, idx,
        HarmonyConfig(nNodes = 4, mode = Mode.Harmony, k = k, nprobe = np),
        F.small.queries)
      try {
        val r = sys.search(F.small.queries)
        (r.report.qps, Recall.meanRecall(r.hits, truths, k))
      } finally sys.shutdown()
    }
    val (qLo, rLo) = run(2)
    val (qHi, rHi) = run(16)
    assert(qLo > qHi)
    assert(rHi >= rLo)
  }

  test("16-node deployment still returns correct results (billion-scale path)") {
    val sys = Harmony.deploy(spark, idx,
      HarmonyConfig(nNodes = 16, mode = Mode.Harmony, k = k, nprobe = nprobe),
      F.small.queries)
    try {
      val r = sys.search(F.small.queries.take(6))
      val fr = Faiss.run(idx, F.small.queries.take(6), k, nprobe, CostParams())
      r.hits.zip(fr.hits).foreach { case (a, b) =>
        a.zip(b).foreach { case (x, y) => assert(math.abs(x.dist - y.dist) < 1e-6) }
      }
      assert(r.report.nNodes == 16)
    } finally sys.shutdown()
  }
}
