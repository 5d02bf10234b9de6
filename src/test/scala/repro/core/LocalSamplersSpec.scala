package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class LocalSamplersSpec extends AnyFunSuite {

  private val kg = KGSummary(Array(
    Cluster(1, 1, 1), Cluster(2, 2, 1), Cluster(3, 3, 3),
    Cluster(4, 10, 5), Cluster(5, 4, 0)))

  // ---- SRS stream ----

  test("SrsStream draining the whole KG sees every triple exactly once") {
    val rng = new Random(1)
    val stream = new LocalSamplers.SrsStream(kg, rng)
    val perCluster = new Array[Int](kg.numClusters)
    val perClusterCorrect = new Array[Int](kg.numClusters)
    (1L to kg.numTriples).foreach { _ =>
      val (idx, ok) = stream.next()
      perCluster(idx) += 1
      if (ok) perClusterCorrect(idx) += 1
    }
    kg.clusters.indices.foreach { i =>
      assert(perCluster(i) == kg.clusters(i).size, s"cluster $i size")
      assert(perClusterCorrect(i) == kg.clusters(i).tau, s"cluster $i tau")
    }
  }

  test("SrsStream refuses to draw beyond the population") {
    val tiny = KGSummary(Array(Cluster(1, 2, 1)))
    val stream = new LocalSamplers.SrsStream(tiny, new Random(2))
    stream.next(); stream.next()
    intercept[IllegalArgumentException](stream.next())
  }

  test("SrsStream sample mean is unbiased") {
    val trials = 3000
    val master = new Random(100) // decorrelated per-trial seeds
    var sum = 0.0
    (0 until trials).foreach { _ =>
      val stream = new LocalSamplers.SrsStream(kg, new Random(master.nextLong()))
      val draws = (1 to 5).map(_ => stream.next()._2)
      sum += draws.count(identity).toDouble / 5
    }
    assert(math.abs(sum / trials - kg.accuracy) < 0.02)
  }

  // ---- cluster draws ----

  test("rcsDraw annotates the full cluster") {
    val d = LocalSamplers.rcsDraw(kg, new Random(3))
    assert(d.annotated == d.cluster.size && d.hits == d.cluster.tau)
  }

  test("rcsDraw is uniform over clusters") {
    val rng = new Random(4)
    val n = 50000
    val counts = collection.mutable.Map.empty[Long, Int].withDefaultValue(0)
    (1 to n).foreach(_ => counts(LocalSamplers.rcsDraw(kg, rng).cluster.id) += 1)
    kg.clusters.foreach(c => assert(math.abs(counts(c.id).toDouble / n - 0.2) < 0.01))
  }

  test("wcsDraw frequency is proportional to cluster size") {
    val rng = new Random(5)
    val n = 50000
    val counts = collection.mutable.Map.empty[Long, Int].withDefaultValue(0)
    (1 to n).foreach(_ => counts(LocalSamplers.wcsDraw(kg, rng).cluster.id) += 1)
    kg.clusters.foreach { c =>
      val expected = c.size.toDouble / kg.numTriples
      assert(math.abs(counts(c.id).toDouble / n - expected) < 0.01, s"cluster ${c.id}")
    }
  }

  test("twcsDraw annotates min(cluster size, m) triples") {
    val rng = new Random(6)
    (1 to 200).foreach { _ =>
      val d = LocalSamplers.twcsDraw(kg, m = 3, rng)
      assert(d.annotated == math.min(d.cluster.size, 3))
      assert(d.hits >= 0 && d.hits <= d.annotated)
    }
  }

  test("twcs sample means are unbiased for the KG accuracy (Proposition 1)") {
    val rng = new Random(7)
    val n = 200000
    val mean = (1 to n).map(_ => LocalSamplers.twcsDraw(kg, 3, rng).sampleMean).sum / n
    assert(math.abs(mean - kg.accuracy) < 0.005)
  }

  test("secondStage with m >= size recovers the exact cluster accuracy") {
    val c = Cluster(9, 6, 4)
    val d = LocalSamplers.secondStage(c, m = 10, new Random(8))
    assert(d.annotated == 6 && d.hits == 4)
    assert(math.abs(d.sampleMean - c.accuracy) < 1e-12)
  }

  test("secondStage hit counts follow the hypergeometric mean") {
    val c = Cluster(9, 20, 8)
    val rng = new Random(9)
    val n = 20000
    val mean = (1 to n).map(_ => LocalSamplers.secondStage(c, 5, rng).hits).sum.toDouble / n
    assert(math.abs(mean - 5.0 * 8 / 20) < 0.05)
  }

  test("wcs draws equal srs-triple cluster frequencies (dart equivalence)") {
    // The probability a WCS draw picks cluster i equals the probability a
    // uniform triple lands in cluster i — the basis of the Spark dart join.
    val rng = new Random(10)
    val n = 30000
    var big = 0
    (1 to n).foreach(_ => if (LocalSamplers.wcsDraw(kg, rng).cluster.id == 4L) big += 1)
    assert(math.abs(big.toDouble / n - 10.0 / 20) < 0.02)
  }
}
