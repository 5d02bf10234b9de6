package repro.bench

import repro.SparkSpec
import repro.core.{KGSummary, Stats}
import repro.kg.KGData
import repro.spark.{SparkEstimators, SparkSamplers}

/** End-to-end distributed pipeline at bench scale (~260K triples): generate a
  * MOVIE-like KG as a DataFrame, sample with the DataFrame samplers, estimate
  * with the DataFrame estimators — the exact dataflow the driver-side
  * Monte-Carlo replicates (DESIGN.md §3.4), exercised at SF≈0.1.
  */
class SparkPipelineBench extends SparkSpec {
  private val z95 = Stats.zAlpha(0.05)

  private lazy val triples = KGData.movieLike(spark, scale = 0.1, seed = 23).cache()
  private lazy val kg      = KGSummary.fromTriples(triples)

  test("distributed TWCS pipeline estimates the KG accuracy") {
    val t0 = System.nanoTime()
    val sample = SparkSamplers.twcsSample(triples, n = 60, m = 5, seed = 24)
    val est = SparkEstimators.clusterEstimate(sample, z95)
    val ms = (System.nanoTime() - t0) / 1e6
    println(f"== Spark pipeline: TWCS n=60 m=5 on ${kg.numTriples} triples: " +
      f"est=${est.value * 100}%.1f%% moe=${est.moe * 100}%.1f%% (${ms}%.0f ms) ==")
    assert(math.abs(est.value - kg.accuracy) < 0.06)
    assert(est.moe < 0.08)
  }

  test("distributed SRS pipeline estimates the KG accuracy") {
    val sample = SparkSamplers.srsTriples(triples, n = 200, seed = 25)
    val est = SparkEstimators.srsEstimate(sample, z95)
    println(f"== Spark pipeline: SRS n=200: est=${est.value * 100}%.1f%% moe=${est.moe * 100}%.1f%% ==")
    assert(math.abs(est.value - kg.accuracy) < 0.06)
  }

  test("distributed RCS pipeline applies the Eq 7 scaling") {
    val draws  = SparkSamplers.rcsClusterDraws(triples, n = 200, seed = 26)
    val sample = SparkSamplers.expandDraws(draws, triples)
    val est = SparkEstimators.rcsEstimate(sample, kg.numClusters.toLong, kg.numTriples, z95)
    println(f"== Spark pipeline: RCS n=200: est=${est.value * 100}%.1f%% moe=${est.moe * 100}%.1f%% ==")
    // RCS is unbiased but high-variance; just require the right ballpark
    assert(math.abs(est.value - kg.accuracy) < 0.25)
  }

  test("distributed reservoir maintains a weighted sample across an update") {
    val summary = SparkSamplers.clusterSummary(triples)
    val baseRes = SparkSamplers.reservoirMerge(
      SparkSamplers.aResKeys(summary, seed = 27),
      SparkSamplers.aResKeys(summary, seed = 27).limit(0), // empty incoming
      capacity = 50)
    assert(baseRes.count() == 50)

    val update = SparkSamplers.clusterSummary(
      KGData.movieLike(spark, scale = 0.02, seed = 29)
        .withColumn("subject", org.apache.spark.sql.functions.col("subject") + 10000000L))
    val merged = SparkSamplers.reservoirMerge(baseRes,
      SparkSamplers.aResKeys(update, seed = 30), capacity = 50)
    assert(merged.count() == 50)
    // weighted reservoir over ~10x more base triples keeps mostly base clusters
    val newcomers = merged.where("subject >= 10000000").count()
    println(s"== Spark pipeline: reservoir update admitted $newcomers/50 new clusters ==")
    assert(newcomers < 25)
  }
}
