package repro.kgeval

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class KGEvalSpec extends AnyFunSuite {
  import KGEval._

  private def mk(rows: Seq[(Long, String, String, Int)]): IndexedSeq[Triple] =
    rows.zipWithIndex.map { case ((s, p, o, l), i) => Triple(i, s, p, o, l) }.toIndexedSeq

  test("every triple ends up labelled: annotated + inferred = |G|") {
    val rng = new Random(1)
    val triples = mk((1 to 100).map { i =>
      (rng.nextInt(20).toLong, s"p${rng.nextInt(5)}", s"o${rng.nextInt(10)}",
        if (rng.nextDouble() < 0.8) 1 else 0)
    })
    val r = KGEval.run(triples, seed = 2)
    assert(r.annotated + r.inferred == triples.size)
    assert(r.annotated >= 1)
  }

  test("a fully coupled KG (one subject) needs a single annotation") {
    val triples = mk((1 to 20).map(i => (7L, s"p$i", s"o$i", 1)))
    val r = KGEval.run(triples, seed = 3)
    assert(r.annotated == 1)
    assert(r.inferred == 19)
  }

  test("a fully decoupled KG (no shared subject or predicate-object) annotates everything") {
    val triples = mk((1 to 15).map(i => (i.toLong, s"p$i", s"o$i", 1)))
    val r = KGEval.run(triples, seed = 4)
    assert(r.annotated == 15)
    assert(r.inferred == 0)
  }

  test("perfect inference (q=1) recovers the exact accuracy") {
    val rng = new Random(5)
    val triples = mk((1 to 200).map { i =>
      (rng.nextInt(30).toLong, s"p${rng.nextInt(4)}", s"o${rng.nextInt(8)}",
        if (rng.nextDouble() < 0.7) 1 else 0)
    })
    val truth = triples.count(_.trueLabel == 1).toDouble / triples.size
    val r = KGEval.run(triples, q = 1.0, seed = 6)
    assert(math.abs(r.estimate - truth) < 1e-12)
  }

  test("noisy inference biases the estimate only mildly at the default q") {
    val rng = new Random(7)
    val triples = mk((1 to 500).map { i =>
      (rng.nextInt(60).toLong, s"p${rng.nextInt(4)}", s"o${rng.nextInt(10)}",
        if (rng.nextDouble() < 0.9) 1 else 0)
    })
    val truth = triples.count(_.trueLabel == 1).toDouble / triples.size
    val r = KGEval.run(triples, seed = 8)
    assert(math.abs(r.estimate - truth) < 0.05, s"est ${r.estimate} truth $truth")
  }

  test("coupling via shared (predicate, object) propagates across subjects") {
    // distinct subjects, but all share one (predicate, object) pair
    val triples = mk((1 to 10).map(i => (i.toLong, "plays", "basketball", 1)))
    val r = KGEval.run(triples, seed = 9)
    assert(r.annotated == 1)
  }

  test("propagation radius matters: hops=0 disables inference reach") {
    val triples = mk((1 to 10).map(i => (5L, s"p$i", s"o$i", 1)))
    val r = KGEval.run(triples, hops = 0, seed = 10)
    assert(r.annotated == 10)
  }

  test("machine time is measured and positive") {
    val triples = mk((1 to 50).map(i => (i.toLong % 5, s"p${i % 3}", s"o${i % 4}", 1)))
    assert(KGEval.run(triples, seed = 11).machineMillis >= 0)
  }

  test("ids must equal indices") {
    val bad = IndexedSeq(Triple(5, 1L, "p", "o", 1))
    intercept[IllegalArgumentException](KGEval.run(bad))
  }

  test("result is deterministic in the seed") {
    val rng = new Random(12)
    val triples = mk((1 to 120).map { i =>
      (rng.nextInt(25).toLong, s"p${rng.nextInt(5)}", s"o${rng.nextInt(9)}",
        if (rng.nextDouble() < 0.85) 1 else 0)
    })
    val a = KGEval.run(triples, seed = 13)
    val b = KGEval.run(triples, seed = 13)
    assert(a.estimate == b.estimate && a.annotated == b.annotated)
  }
}
