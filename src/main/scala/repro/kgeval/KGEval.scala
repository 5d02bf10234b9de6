package repro.kgeval

import scala.collection.mutable
import scala.util.Random

/** Reimplementation of the KGEval baseline (Ojha & Talukdar, EMNLP 2017) —
  * the comparator of Table 6.
  *
  * KGEval exploits coupling constraints among triples: knowing the
  * correctness of one triple lets an inference mechanism (PSL in the
  * original) propagate correctness to coupled triples. Its control loop
  * repeatedly picks the triple whose evaluation would propagate to the most
  * still-unlabelled triples, has a human annotate it, and infers labels for
  * its coupled neighbourhood, until every triple carries a label; the KG
  * accuracy estimate is the mean over all (annotated + inferred) labels.
  *
  * Substitution (DESIGN.md §3.3): PSL is unavailable offline, so coupling is
  * structural — triples are coupled when they share a subject (same-entity
  * coupling) or share (predicate, object) (type-consistency coupling) — and
  * inference is a noisy copy: an inferred label equals the triple's true
  * label with probability `q`. Seed selection scans every unlabelled triple
  * and its 2-hop neighbourhood each round, reproducing the expensive machine
  * time that makes KGEval unscalable (machine cost grows superlinearly in
  * |G|, vs. well under a second for TWCS).
  */
object KGEval {

  /** A triple as KGEval sees it. */
  final case class Triple(id: Int, subject: Long, predicate: String,
                          objectV: String, trueLabel: Int)

  /** @param estimate      accuracy estimate from all labels
    * @param annotated     number of human-annotated (seed) triples
    * @param inferred      number of machine-inferred labels
    * @param machineMillis measured control-loop machine time
    */
  final case class Result(estimate: Double, annotated: Int, inferred: Int,
                          machineMillis: Long)

  /** Adjacency over the coupling constraints. */
  private def buildAdjacency(triples: IndexedSeq[Triple]): Array[Array[Int]] = {
    val bySubject = triples.groupBy(_.subject)
    val byPredObj = triples.groupBy(t => (t.predicate, t.objectV))
    val adj = Array.fill(triples.size)(mutable.LinkedHashSet.empty[Int])
    def link(group: Iterable[Triple]): Unit = {
      val ids = group.map(_.id).toArray
      if (ids.length > 1) {
        var i = 0
        while (i < ids.length) {
          var j = 0
          while (j < ids.length) {
            if (i != j) adj(ids(i)) += ids(j)
            j += 1
          }
          i += 1
        }
      }
    }
    bySubject.values.foreach(link)
    byPredObj.values.foreach(link)
    adj.map(_.toArray)
  }

  /** Unlabelled triples within `hops` of `start` (inclusive). */
  private def ball(adj: Array[Array[Int]], labelled: Array[Boolean],
                   start: Int, hops: Int): mutable.ArrayBuffer[Int] = {
    val seen = mutable.BitSet(start)
    var frontier = List(start)
    var h = 0
    while (h < hops && frontier.nonEmpty) {
      frontier = frontier.flatMap(u => adj(u).iterator.filterNot(seen)).distinct
      frontier.foreach(seen += _)
      h += 1
    }
    val out = mutable.ArrayBuffer.empty[Int]
    seen.foreach(i => if (!labelled(i)) out += i)
    out
  }

  /** Run KGEval until every triple is labelled.
    *
    * @param q    inference fidelity: an inferred label matches the true label
    *             with probability q (the original's PSL inference is also
    *             imperfect — §8 "might lead to erroneous propagations")
    * @param hops propagation radius over the coupling graph
    */
  def run(triples: IndexedSeq[Triple], q: Double = 0.98, hops: Int = 2,
          seed: Long = 7): Result = {
    require(triples.nonEmpty)
    require(triples.zipWithIndex.forall { case (t, i) => t.id == i },
      "triple ids must be their indices")
    val rng = new Random(seed)
    val t0  = System.nanoTime()
    val adj = buildAdjacency(triples)
    val labels    = new Array[Int](triples.size)
    val labelled  = new Array[Boolean](triples.size)
    var remaining = triples.size
    var annotated = 0

    while (remaining > 0) {
      // control mechanism: exhaustive scan for the seed whose 2-hop coupling
      // ball covers the most unlabelled triples (the expensive part)
      var best = -1
      var bestCover = -1
      var i = 0
      while (i < triples.size) {
        if (!labelled(i)) {
          val cover = ball(adj, labelled, i, hops).size
          if (cover > bestCover) { bestCover = cover; best = i }
        }
        i += 1
      }
      // human annotates the seed
      val reach = ball(adj, labelled, best, hops)
      labels(best) = triples(best).trueLabel
      labelled(best) = true
      remaining -= 1
      annotated += 1
      // inference propagates (noisily) through the seed's coupling ball
      reach.foreach { j =>
        if (!labelled(j)) {
          val ok = rng.nextDouble() < q
          labels(j) = if (ok) triples(j).trueLabel else 1 - triples(j).trueLabel
          labelled(j) = true
          remaining -= 1
        }
      }
    }
    val est = labels.sum.toDouble / triples.size
    Result(est, annotated, triples.size - annotated,
      (System.nanoTime() - t0) / 1000000L)
  }
}
