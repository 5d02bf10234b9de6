package repro.evolve

import org.scalatest.funsuite.AnyFunSuite

import repro.core.Cluster

import scala.util.Random

class ReservoirSpec extends AnyFunSuite {

  test("reservoir fills to capacity and never beyond") {
    val r = new WeightedReservoir[Unit](3)
    val rng = new Random(1)
    (1 to 10).foreach(i => r.offer(Cluster(i.toLong, 1, 1), rng)(()))
    assert(r.size == 3)
  }

  test("offering fewer clusters than capacity keeps them all") {
    val r = new WeightedReservoir[Unit](5)
    val rng = new Random(2)
    (1 to 3).foreach(i => r.offer(Cluster(i.toLong, 2, 1), rng)(()))
    assert(r.size == 3)
    assert(r.totalInsertions == 3)
  }

  test("payload is created only on insertion") {
    var created = 0
    val r = new WeightedReservoir[Int](2)
    val rng = new Random(3)
    (1 to 500).foreach { i =>
      r.offer(Cluster(i.toLong, 1, 1), rng) { created += 1; i }
    }
    assert(created.toLong == r.totalInsertions)
    assert(created < 500) // most offers are rejected once the reservoir is warm
  }

  test("A-Res keys are weighted: a 9x larger cluster wins ~90% of the time") {
    val rng = new Random(4)
    var bigWins = 0
    val trials = 20000
    (1 to trials).foreach { _ =>
      val r = new WeightedReservoir[Unit](1)
      r.offer(Cluster(1, 1, 1), rng)(())
      r.offer(Cluster(2, 9, 9), rng)(())
      if (r.entries.head.cluster.id == 2L) bigWins += 1
    }
    assert(math.abs(bigWins.toDouble / trials - 0.9) < 0.01, s"got ${bigWins.toDouble / trials}")
  }

  test("uniform weights give uniform inclusion probabilities") {
    val rng = new Random(5)
    val counts = new Array[Int](10)
    val trials = 20000
    (1 to trials).foreach { _ =>
      val r = new WeightedReservoir[Unit](2)
      (0 until 10).foreach(i => r.offer(Cluster(i.toLong, 3, 3), rng)(()))
      r.entries.foreach(e => counts(e.cluster.id.toInt) += 1)
    }
    counts.foreach { c =>
      assert(math.abs(c.toDouble / trials - 0.2) < 0.02)
    }
  }

  test("Proposition 3: insertions grow as |R| log(N_j/N_i), not linearly") {
    val rng = new Random(6)
    val capacity = 20
    val r = new WeightedReservoir[Unit](capacity)
    (1 to capacity).foreach(i => r.offer(Cluster(i.toLong, 2, 1), rng)(()))
    val after = r.totalInsertions
    (capacity + 1 to 10000).foreach(i => r.offer(Cluster(i.toLong, 2, 1), rng)(()))
    val tail = r.totalInsertions - after
    val expected = capacity * math.log(10000.0 / capacity) // ≈ 124
    assert(tail > expected * 0.5 && tail < expected * 2.0, s"got $tail vs ~$expected")
  }

  test("keyFor lies in (0,1] and larger sizes push keys towards 1") {
    val r = new WeightedReservoir[Unit](1)
    val rng = new Random(7)
    val small = (1 to 3000).map(_ => r.keyFor(Cluster(1, 1, 1), rng))
    val large = (1 to 3000).map(_ => r.keyFor(Cluster(2, 50, 1), rng))
    assert(small.forall(k => k > 0 && k <= 1))
    assert(large.sum / 3000 > small.sum / 3000)
  }

  test("rejects non-positive capacity") {
    intercept[IllegalArgumentException](new WeightedReservoir[Unit](0))
  }
}
