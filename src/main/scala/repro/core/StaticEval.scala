package repro.core

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Configuration of the iterative evaluation framework (Fig 2).
  *
  * @param eps             user-required margin of error (default 5%)
  * @param alpha           1 - confidence level (default 5% -> 95% CI)
  * @param srsBatch        triples per SRS iteration; also the CLT minimum n
  * @param clusterBatch    first-stage cluster draws per iteration
  * @param minClusterDraws minimum first-stage draws before the MoE stop rule
  * @param minTriples      minimum annotated triples before the MoE stop rule
  *                        for cluster designs (the CLT n>30 rule of thumb —
  *                        reproduces the paper's ~30-triple YAGO samples and
  *                        its ~24-draw TWCS(m=10) run on MOVIE)
  * @param maxCostSeconds  annotation budget; exceeded => stop unconverged
  *                        (the paper caps RCS/WCS on MOVIE at 5 hours)
  */
final case class EvalConfig(eps: Double = 0.05,
                            alpha: Double = 0.05,
                            srsBatch: Int = 30,
                            clusterBatch: Int = 5,
                            minClusterDraws: Int = 5,
                            minTriples: Long = 30,
                            maxCostSeconds: Double = Double.PositiveInfinity,
                            cost: CostModel = CostModel.default) {
  require(eps > 0 && eps < 1 && alpha > 0 && alpha < 1)
  def z: Double = Stats.zAlpha(alpha)
}

/** Outcome of one evaluation run. Costs follow Eq (4) on distinct sets. */
final case class EvalResult(estimate: Double,
                            moe: Double,
                            clusterDraws: Int,
                            entities: Int,
                            triples: Long,
                            costSeconds: Double,
                            converged: Boolean) {
  def costHours: Double = costSeconds / 3600.0
}

/** Static Evaluation (§4): iteratively sample, annotate, estimate and stop as
  * soon as MoE <= eps — one method per sampling design of §5.
  */
object StaticEval {

  /** SRS: batches of `srsBatch` triples without replacement, Eq (5) estimator. */
  def srs(kg: KGSummary, cfg: EvalConfig, rng: Random): EvalResult = {
    val z       = cfg.z
    val stream  = new LocalSamplers.SrsStream(kg, rng)
    val tracker = new CostTracker(cfg.cost)
    var n       = 0L
    var correct = 0L
    var est     = Estimate(0.0, Double.PositiveInfinity)
    var stop    = false
    while (!stop) {
      var i = 0
      while (i < cfg.srsBatch && n < kg.numTriples) {
        val (idx, ok) = stream.next()
        val c = kg.clusters(idx)
        tracker.record(c.id, c.size, 1)
        n += 1
        if (ok) correct += 1
        i += 1
      }
      est = Estimators.srs(correct, n, z)
      stop = (n >= cfg.srsBatch && est.moe <= cfg.eps) ||
             n >= kg.numTriples ||
             tracker.seconds >= cfg.maxCostSeconds
    }
    EvalResult(est.value, est.moe, 0, tracker.entities, tracker.triples,
      tracker.seconds, est.moe <= cfg.eps)
  }

  private def clusterLoop(cfg: EvalConfig, tracker: CostTracker,
                          drawOne: () => (LocalSamplers.ClusterDraw, Double)): EvalResult = {
    val z      = cfg.z
    val values = ArrayBuffer.empty[Double]
    var est    = Estimate(0.0, Double.PositiveInfinity)
    var stop   = false
    while (!stop) {
      var i = 0
      while (i < cfg.clusterBatch) {
        val (d, v) = drawOne()
        tracker.record(d.cluster.id, d.cluster.size, d.annotated)
        values += v
        i += 1
      }
      est = Estimators.meanOfDraws(values.toSeq, z)
      stop = (values.size >= cfg.minClusterDraws &&
              tracker.triples >= cfg.minTriples &&
              est.moe <= cfg.eps) ||
             tracker.seconds >= cfg.maxCostSeconds
    }
    EvalResult(est.value, est.moe, values.size, tracker.entities, tracker.triples,
      tracker.seconds, est.moe <= cfg.eps)
  }

  /** RCS (§5.2.1): uniform cluster draws, v_k = (N/M)·τ_{I_k}. */
  def rcs(kg: KGSummary, cfg: EvalConfig, rng: Random): EvalResult = {
    val scale = kg.numClusters.toDouble / kg.numTriples
    clusterLoop(cfg, new CostTracker(cfg.cost), () => {
      val d = LocalSamplers.rcsDraw(kg, rng)
      (d, scale * d.hits)
    })
  }

  /** WCS (§5.2.2): size-weighted draws, v_k = μ_{I_k} (Hansen–Hurwitz). */
  def wcs(kg: KGSummary, cfg: EvalConfig, rng: Random): EvalResult =
    clusterLoop(cfg, new CostTracker(cfg.cost), () => {
      val d = LocalSamplers.wcsDraw(kg, rng)
      (d, d.cluster.accuracy)
    })

  /** TWCS (§5.2.3): size-weighted draws + second-stage SRS of <= m triples. */
  def twcs(kg: KGSummary, m: Int, cfg: EvalConfig, rng: Random): EvalResult =
    clusterLoop(cfg, new CostTracker(cfg.cost), () => {
      val d = LocalSamplers.twcsDraw(kg, m, rng)
      (d, d.sampleMean)
    })

  /** TWCS with stratification (§5.3): per-stratum TWCS estimators combined by
    * Eq (13); each iteration allocates `clusterBatch` draws greedily to the
    * stratum with the largest marginal variance reduction
    * W_h²·s_h²·(1/n_h - 1/(n_h+1)).
    */
  def twcsStratified(strata: Seq[Stratification.StratumPop], m: Int,
                     cfg: EvalConfig, rng: Random): EvalResult = {
    require(strata.nonEmpty)
    val z       = cfg.z
    val ws      = Stratification.weights(strata)
    val tracker = new CostTracker(cfg.cost)
    val values  = strata.map(_ => ArrayBuffer.empty[Double])
    // variance floor keeps exploring strata whose few draws happened to agree
    val varFloor = 1e-4

    def drawIn(h: Int): Unit = {
      val d = LocalSamplers.twcsDraw(strata(h).kg, m, rng)
      tracker.record(d.cluster.id, d.cluster.size, d.annotated)
      values(h) += d.sampleMean
    }

    // Initial allocation: enough draws per stratum for a usable variance
    // estimate — stopping off 2 agreeing draws would bias the estimator —
    // and a total triple floor (CLT) before the MoE rule may fire.
    val minPerStratum = math.max(3, math.ceil(20.0 / strata.size).toInt)
    strata.indices.foreach { h =>
      (0 until minPerStratum).foreach(_ => drawIn(h))
    }

    def combined(): Estimate = {
      val ss = strata.indices.map { h =>
        Estimators.Stratum(ws(h), Stats.mean(values(h).toSeq),
          Estimators.varOfMean(values(h).toSeq))
      }
      Estimators.stratified(ss, z)
    }

    def totalDraws: Int = values.map(_.size).sum
    def mayStop: Boolean =
      totalDraws >= cfg.minClusterDraws && tracker.triples >= cfg.minTriples

    var est  = combined()
    var stop = (mayStop && est.moe <= cfg.eps) ||
               tracker.seconds >= cfg.maxCostSeconds
    while (!stop) {
      var i = 0
      while (i < cfg.clusterBatch) {
        val h = strata.indices.maxBy { h =>
          val nH = values(h).size.toDouble
          val s2 = math.max(Stats.sampleVariance(values(h).toSeq), varFloor)
          ws(h) * ws(h) * s2 * (1.0 / nH - 1.0 / (nH + 1.0))
        }
        drawIn(h)
        i += 1
      }
      est = combined()
      stop = (mayStop && est.moe <= cfg.eps) ||
             tracker.seconds >= cfg.maxCostSeconds
    }
    EvalResult(est.value, est.moe, totalDraws, tracker.entities,
      tracker.triples, tracker.seconds, est.moe <= cfg.eps)
  }

  // ------------------------------------------------------------------
  // Monte-Carlo replication (the paper averages 1000 random runs)
  // ------------------------------------------------------------------

  /** Aggregate statistics over repeated evaluation runs. */
  final case class McStats(trials: Int,
                           meanEstimate: Double, sdEstimate: Double,
                           estP2p5: Double, estP97p5: Double,
                           meanCostHours: Double, sdCostHours: Double,
                           meanTriples: Double, sdTriples: Double,
                           meanEntities: Double, meanClusterDraws: Double,
                           convergedFrac: Double)

  /** Run `trials` independent evaluations. Per-trial seeds come from a master
    * RNG — sequential raw seeds (seed+t) correlate java.util.Random's first
    * outputs enough to visibly bias Monte-Carlo means.
    */
  def monteCarlo(trials: Int, seed: Long)(run: Random => EvalResult): McStats = {
    require(trials >= 1)
    val master  = new Random(seed)
    val results = (0 until trials).map(_ => run(new Random(master.nextLong())))
    val ests  = results.map(_.estimate)
    val costs = results.map(_.costHours)
    val trs   = results.map(_.triples.toDouble)
    val sortedEst = ests.sorted
    def pct(p: Double): Double = sortedEst(math.min(ests.size - 1, (p * ests.size).toInt))
    McStats(
      trials,
      Stats.mean(ests), math.sqrt(Stats.sampleVariance(ests)),
      pct(0.025), pct(0.975),
      Stats.mean(costs), math.sqrt(Stats.sampleVariance(costs)),
      Stats.mean(trs), math.sqrt(Stats.sampleVariance(trs)),
      Stats.mean(results.map(_.entities.toDouble)),
      Stats.mean(results.map(_.clusterDraws.toDouble)),
      results.count(_.converged).toDouble / trials)
  }
}
