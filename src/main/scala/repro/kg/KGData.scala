package repro.kg

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.Cluster

import scala.util.Random

/** Synthetic knowledge graphs matched to the data characteristics of Table 3.
  *
  * Each generator yields a triples DataFrame
  *   (subject: long, predicate: string, object: string, label: int)
  * where `label` is the ground-truth correctness (1 = correct). Subjects are
  * dense ids; an entity cluster is the set of rows sharing a subject.
  *
  * See DESIGN.md §3 for the dataset substitutions: the paper's results depend
  * only on the cluster-size distribution, the per-cluster accuracy
  * distribution, and the cost constants — all of which these generators
  * reproduce.
  */
object KGData {

  /** Expand an entity table (subject, size, p) into labelled triples. The
    * predicate/object vocabularies control the coupling density that the
    * KGEval baseline exploits: fewer distinct (predicate, object) pairs =>
    * denser coupling graph => fewer KGEval seed annotations.
    */
  def explodeToTriples(entities: DataFrame, nPred: Int, nObj: Int,
                       objConcentration: Double, seed: Long): DataFrame =
    entities
      .select(col("subject"), col("p"),
              explode(sequence(lit(1), col("size"))).as("__line"))
      .select(
        col("subject"),
        concat(lit("p"), floor(rand(seed) * nPred).cast("long")).as("predicate"),
        concat(lit("o"), floor(pow(rand(seed + 1), objConcentration) * nObj).cast("long")).as("object"),
        (rand(seed + 2) < col("p")).cast("int").as("label"))

  /** (subject, size, p) entity table. `size` must be built from the
    * materialized columns `r1`/`r2`/`r3` — referencing a raw `rand()` column
    * several times inside a when-chain re-draws the RNG per branch and skews
    * the distribution (Spark evaluates each occurrence of a nondeterministic
    * expression independently). A projection boundary pins one value per row.
    */
  private def entityTable(spark: SparkSession, n: Long, size: Column,
                          model: LabelModel, seed: Long): DataFrame =
    spark.range(1, n + 1)
      .select(col("id").as("subject"),
              rand(seed).as("r1"), rand(seed + 1).as("r2"), rand(seed + 2).as("r3"),
              randn(seed + 9).as("n1"))
      .select(col("subject"), size.cast("int").as("size"))
      .select(col("subject"), col("size"), model.pColumn(col("size"), seed + 3).as("p"))

  /** NELL-like: 817 entities, ≈1.9K triples, ≈98% of clusters of size <= 4
    * with a thin 5..30 tail (mean ≈2.3). Labels: per-cluster accuracy
    * clamp(N(0.97, 0.17²)) -> overall ≈91%, heterogeneous and independent of
    * size. Small predicate/object vocabularies (domain-specific KG) give the
    * dense coupling KGEval needs.
    */
  def nellLike(spark: SparkSession, seed: Long = 11): DataFrame = {
    val small = when(col("r2") < 0.45, 1).when(col("r2") < 0.70, 2)
      .when(col("r2") < 0.88, 3).otherwise(4)
    val size  = when(col("r1") < 0.98, small)
      .otherwise((floor(col("r3") * 26) + 5).cast("int"))
    val ents = entityTable(spark, 817, size,
      LabelModels.NoisyCluster(0.97, 0.17), seed)
    explodeToTriples(ents, nPred = 8, nObj = 40, objConcentration = 1.5, seed = seed + 4)
  }

  /** YAGO-like: 822 entities, ≈1.4K triples (mean cluster ≈1.7), REM p=0.99.
    * Broader vocabularies (general-domain KG) => sparser coupling graph.
    */
  def yagoLike(spark: SparkSession, seed: Long = 13): DataFrame = {
    val size = when(col("r1") < 0.55, 1).when(col("r1") < 0.85, 2)
      .when(col("r1") < 0.95, 3).when(col("r1") < 0.98, 4).otherwise(5)
    val ents = entityTable(spark, 822, size, LabelModels.REM(0.01), seed)
    explodeToTriples(ents, nPred = 10, nObj = 50, objConcentration = 1.5, seed = seed + 2)
  }

  /** MOVIE-like: log-normal cluster sizes (mean ≈9, heavy tail into the
    * thousands); at scale=1.0, 288,770 entities / ≈2.6M triples. Default
    * labels REM(0.1) -> 90% overall, matching MOVIE's measured gold accuracy.
    */
  def movieLike(spark: SparkSession, scale: Double = 1.0,
                model: LabelModel = LabelModels.REM(0.1),
                seed: Long = 17): DataFrame = {
    val n = math.max(1L, math.round(288770 * scale))
    val size = greatest(lit(1L),
      round(exp(col("n1") * LocalKGGen.MovieSigma + LocalKGGen.MovieMu)))
    val ents = entityTable(spark, n, size, model, seed)
    explodeToTriples(ents, nPred = 12, nObj = 1000000, objConcentration = 1.0, seed = seed + 2)
  }

  /** MOVIE-SYN: MOVIE-like sizes with Binomial-Mixture labels (Eq 15). */
  def movieSyn(spark: SparkSession, scale: Double = 1.0,
               c: Double = 0.01, sigma: Double = 0.1, k: Int = 3,
               seed: Long = 19): DataFrame =
    movieLike(spark, scale, LabelModels.BMM(c, sigma, k), seed)
}

/** Driver-side mirror of the MOVIE-like cluster generator — used to produce
  * evolving-KG update batches (the paper draws updates from MOVIE-FULL)
  * without a Spark job per Monte-Carlo batch. Identical distributions to
  * [[KGData.movieLike]].
  */
object LocalKGGen {
  /** Log-normal parameters of the MOVIE-like cluster-size law. */
  val MovieMu    = 1.35
  val MovieSigma = 1.3

  /** One log-normal MOVIE-like cluster size. */
  def movieSize(rng: Random): Int =
    math.max(1L, math.round(math.exp(rng.nextGaussian() * MovieSigma + MovieMu))).toInt

  /** Binomial(n, p) by direct simulation (n is a cluster size — small). */
  def binomial(rng: Random, n: Int, p: Double): Int = {
    var hits = 0
    var i = 0
    while (i < n) { if (rng.nextDouble() < p) hits += 1; i += 1 }
    hits
  }

  /** A batch of MOVIE-like clusters under a label model, with ids starting at
    * `idOffset` (update batches must not collide with base subjects).
    */
  def movieClusters(n: Int, model: LabelModel, rng: Random, idOffset: Long): Array[Cluster] =
    Array.tabulate(n) { i =>
      val size = movieSize(rng)
      val p    = model.p(size, rng)
      Cluster(idOffset + i, size, binomial(rng, size, p))
    }

  /** Clusters totalling approximately `targetTriples` triples. */
  def movieClustersByTriples(targetTriples: Long, model: LabelModel,
                             rng: Random, idOffset: Long): Array[Cluster] = {
    val out = Array.newBuilder[Cluster]
    var total = 0L
    var i = 0L
    while (total < targetTriples) {
      val size = movieSize(rng)
      val p    = model.p(size, rng)
      out += Cluster(idOffset + i, size, binomial(rng, size, p))
      total += size
      i += 1
    }
    out.result()
  }
}
