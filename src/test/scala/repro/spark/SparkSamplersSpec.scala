package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.core.KGSummary

class SparkSamplersSpec extends SparkSpec {
  import spark.implicits._

  /** 4 clusters with sizes 1/2/3/6 and known labels. */
  private lazy val triples: DataFrame = Seq(
    (1L, "pA", "o1", 1),
    (2L, "pA", "o2", 1), (2L, "pB", "o3", 0),
    (3L, "pA", "o1", 1), (3L, "pB", "o4", 1), (3L, "pC", "o5", 0),
    (4L, "pA", "o1", 1), (4L, "pA", "o2", 1), (4L, "pB", "o3", 1),
    (4L, "pB", "o4", 0), (4L, "pC", "o5", 0), (4L, "pC", "o6", 1)
  ).toDF("subject", "predicate", "object", "label").cache()

  // ---- cluster summary ----

  test("clusterSummary matches DuckDB's groupBy (oracle)") {
    Oracle.assertEquivalent(
      SparkSamplers.clusterSummary(triples),
      "SELECT CAST(subject AS BIGINT) AS subject, COUNT(*) AS size, " +
        "SUM(CAST(label AS BIGINT)) AS tau FROM t GROUP BY subject",
      "t" -> triples)
  }

  test("KGSummary.fromTriples reflects the DataFrame aggregation") {
    val kg = KGSummary.fromTriples(triples)
    assert(kg.numClusters == 4)
    assert(kg.numTriples == 12)
    assert(math.abs(kg.accuracy - 8.0 / 12) < 1e-12)
    assert(kg.clusters.find(_.id == 4L).get.tau == 4)
  }

  // ---- SRS ----

  test("srsTriples returns exactly n distinct triples from the input") {
    val s = SparkSamplers.srsTriples(triples, 5, seed = 1).collect()
    assert(s.length == 5)
    assert(s.distinct.length == 5)
    val all = triples.collect().map(_.toSeq).toSet
    assert(s.forall(r => all.contains(r.toSeq)))
  }

  test("srsTriples with n = |G| returns the whole KG") {
    assert(SparkSamplers.srsTriples(triples, 12, seed = 2).count() == 12)
  }

  test("srsTriples is deterministic in its seed") {
    val a = SparkSamplers.srsTriples(triples, 4, seed = 3).collect().map(_.toSeq).toSet
    val b = SparkSamplers.srsTriples(triples, 4, seed = 3).collect().map(_.toSeq).toSet
    assert(a == b)
  }

  test("srsTriples is (statistically) uniform over triples") {
    // one large draw: each triple appears at most once; over seeds the
    // count per subject should be size-proportional
    val counts = (0 until 40).flatMap { s =>
      SparkSamplers.srsTriples(triples, 6, seed = 100 + s)
        .groupBy("subject").count().collect()
        .map(r => r.getAs[Long]("subject") -> r.getAs[Long]("count"))
    }.groupBy(_._1).view.mapValues(_.map(_._2).sum).toMap
    // cluster 4 holds half the triples -> about half of all sampled rows
    val total = counts.values.sum.toDouble
    assert(math.abs(counts(4L) / total - 0.5) < 0.1)
  }

  // ---- WCS / RCS first stage ----

  test("wcsClusterDraws yields one row per draw") {
    val d = SparkSamplers.wcsClusterDraws(triples, 25, seed = 4)
    assert(d.count() == 25)
    assert(d.select("draw_id").distinct().count() == 25)
  }

  test("wcsClusterDraws frequencies are proportional to cluster size") {
    val d = SparkSamplers.wcsClusterDraws(triples, 3000, seed = 5)
      .groupBy("subject").count().collect()
      .map(r => r.getAs[Long]("subject") -> r.getAs[Long]("count")).toMap
    assert(math.abs(d(4L) / 3000.0 - 0.5) < 0.04)  // 6/12
    assert(math.abs(d(1L) / 3000.0 - 1.0 / 12) < 0.03)
  }

  test("rcsClusterDraws frequencies are uniform over clusters") {
    val d = SparkSamplers.rcsClusterDraws(triples, 2000, seed = 6)
      .groupBy("subject").count().collect()
      .map(r => r.getAs[Long]("subject") -> r.getAs[Long]("count")).toMap
    Seq(1L, 2L, 3L, 4L).foreach { s =>
      assert(math.abs(d(s) / 2000.0 - 0.25) < 0.04, s"subject $s")
    }
  }

  test("expandDraws keeps duplicate first-stage draws as independent replicates") {
    val draws = Seq((0L, 4L), (1L, 4L)).toDF("draw_id", "subject")
    val x = SparkSamplers.expandDraws(draws, triples)
    assert(x.count() == 12) // 6 triples x 2 draws
    assert(x.groupBy("draw_id").count().collect().forall(_.getAs[Long]("count") == 6))
  }

  // ---- TWCS second stage ----

  test("twcsSample annotates at most m triples per draw, all from one cluster") {
    val s = SparkSamplers.twcsSample(triples, n = 50, m = 2, seed = 7)
    val per = s.groupBy("draw_id")
      .agg(count(lit(1)).as("cnt"), countDistinct(col("subject")).as("subs"))
      .collect()
    assert(per.length == 50)
    assert(per.forall(r => r.getAs[Long]("cnt") <= 2 && r.getAs[Long]("subs") == 1))
  }

  test("secondStage samples within a cluster without replacement") {
    val draws = Seq((0L, 4L)).toDF("draw_id", "subject")
    val s = SparkSamplers.secondStage(draws, triples, m = 4, seed = 8).collect()
    assert(s.length == 4)
    assert(s.map(_.toSeq).distinct.length == 4)
  }

  test("secondStage with m above the cluster size returns the full cluster") {
    val draws = Seq((0L, 2L)).toDF("draw_id", "subject")
    assert(SparkSamplers.secondStage(draws, triples, m = 99, seed = 9).count() == 2)
  }

  // ---- reservoir ----

  test("aResKeys produces keys in (0, 1]") {
    val keys = SparkSamplers.aResKeys(SparkSamplers.clusterSummary(triples), seed = 10)
      .select("key").collect().map(_.getAs[Double]("key"))
    assert(keys.length == 4)
    assert(keys.forall(k => k > 0.0 && k <= 1.0))
  }

  test("aResKeys favours larger clusters (keys closer to 1)") {
    // u^(1/size): across seeds, the size-6 cluster should out-rank size-1
    val wins = (0 until 60).count { s =>
      val keys = SparkSamplers.aResKeys(SparkSamplers.clusterSummary(triples), seed = 100 + s)
        .select("subject", "key").collect()
        .map(r => r.getAs[Long]("subject") -> r.getAs[Double]("key")).toMap
      keys(4L) > keys(1L)
    }
    assert(wins > 40, s"size-6 cluster won only $wins/60 seeds")
  }

  test("reservoirMerge keeps the top-capacity keys (oracle)") {
    val current = Seq((1L, 3L, 2L, 0.91), (2L, 1L, 1L, 0.35), (3L, 5L, 5L, 0.78))
      .toDF("subject", "size", "tau", "key")
    val incoming = Seq((10L, 4L, 4L, 0.95), (11L, 2L, 0L, 0.10))
      .toDF("subject", "size", "tau", "key")
    val merged = SparkSamplers.reservoirMerge(current, incoming, capacity = 3)
    Oracle.assertEquivalent(
      merged,
      """SELECT CAST(subject AS BIGINT) AS subject, CAST(size AS BIGINT) AS size,
        |       CAST(tau AS BIGINT) AS tau, CAST(key AS DOUBLE) AS key
        |FROM (SELECT *, row_number() OVER (ORDER BY CAST(key AS DOUBLE) DESC,
        |                                   CAST(subject AS BIGINT)) AS rn
        |      FROM (SELECT * FROM cur UNION ALL SELECT * FROM inc))
        |WHERE rn <= 3""".stripMargin,
      "cur" -> current, "inc" -> incoming)
  }

  test("reservoirMerge never exceeds its capacity") {
    val a = Seq((1L, 1L, 1L, 0.5), (2L, 1L, 0L, 0.6)).toDF("subject", "size", "tau", "key")
    val b = Seq((3L, 1L, 1L, 0.7), (4L, 1L, 1L, 0.8)).toDF("subject", "size", "tau", "key")
    assert(SparkSamplers.reservoirMerge(a, b, 2).count() == 2)
    // and it keeps the two largest keys
    val kept = SparkSamplers.reservoirMerge(a, b, 2).select("subject").collect()
      .map(_.getAs[Long]("subject")).toSet
    assert(kept == Set(3L, 4L))
  }
}
