package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** One entity cluster: all triples sharing a subject id.
  *
  * @param id   subject id
  * @param size M_i, number of triples in the cluster
  * @param tau  τ_i, number of *correct* triples in the cluster (ground truth)
  */
final case class Cluster(id: Long, size: Int, tau: Int) {
  require(size >= 1, s"empty cluster $id")
  require(tau >= 0 && tau <= size, s"cluster $id has tau=$tau outside [0,$size]")
  /** μ_i, cluster accuracy. */
  def accuracy: Double = tau.toDouble / size
}

/** Driver-side view of a KG for sampling designs: everything a sampler needs
  * is the list of clusters with (size, #correct). Individual triple draws
  * within a cluster are exact hypergeometric draws, so no per-triple state
  * is required (see DESIGN.md §3.4).
  */
final case class KGSummary(clusters: Array[Cluster]) {
  require(clusters.nonEmpty, "empty KG")

  /** N — number of entity clusters. */
  val numClusters: Int = clusters.length
  /** M — total number of triples. */
  val numTriples: Long = clusters.map(_.size.toLong).sum
  /** True KG accuracy μ(G) = Σ τ_i / M. */
  val accuracy: Double = clusters.map(_.tau.toLong).sum.toDouble / numTriples
  /** Mean cluster size M/N. */
  def meanClusterSize: Double = numTriples.toDouble / numClusters

  /** Weighted index over cluster sizes for draws ∝ M_i. */
  lazy val sizeWeights: CumulativeWeights = new CumulativeWeights(clusters.map(_.size.toLong))
}

object KGSummary {

  /** Cluster summary as a DataFrame aggregation — the distributed half of the
    * workload. Input must have columns `subject` and `label` (0/1).
    * Output: (subject, size, tau).
    */
  def clusterSummaryDF(triples: DataFrame): DataFrame =
    triples.groupBy(col("subject"))
      .agg(count(lit(1)).as("size"), sum(col("label")).as("tau"))

  /** Collect the Spark cluster summary into the driver-side [[KGSummary]].
    * Fine for all KGs in this reproduction (≤ ~300K clusters).
    */
  def fromTriples(triples: DataFrame): KGSummary = {
    val rows = clusterSummaryDF(triples).collect()
    KGSummary(rows.map(r => Cluster(
      r.getAs[Long]("subject"),
      r.getAs[Long]("size").toInt,
      r.getAs[Long]("tau").toInt)))
  }

  /** Build directly from driver-side clusters (evolving-KG update batches). */
  def local(clusters: Seq[Cluster]): KGSummary = KGSummary(clusters.toArray)
}
