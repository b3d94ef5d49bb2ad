package repro.core

import repro.index.HeuristicIndex
import scala.collection.mutable

/** Candidate-heuristic generation (paper Algorithm 2): greedy best-first
  * expansion of the index from the virtual root '*', repeatedly taking the
  * candidate with the highest coverage over the discovered positives P and
  * adding its index children to the pool.
  */
object CandidateGen {

  /** @return up to ``k`` candidate heuristic reprs, in selection order. */
  def generate(index: HeuristicIndex, pos: java.util.BitSet, k: Int): Vector[String] = {
    // Max-heap on (coverage over P, total coverage, repr) — ties broken
    // toward higher total coverage (more generic first, as in the paper's
    // "most generic functions at the top"), then lexicographically for
    // determinism.
    final case class Cand(repr: String, posCount: Int, count: Int)
    implicit val ord: Ordering[Cand] =
      Ordering.by((c: Cand) => (c.posCount, c.count, c.repr))

    val heap    = mutable.PriorityQueue.empty[Cand]
    val seen    = mutable.HashSet.empty[String]
    val result  = Vector.newBuilder[String]
    var nTaken  = 0

    def push(p: String): Unit =
      if (seen.add(p))
        heap.enqueue(Cand(p, index.posCount(p, pos), index.count(p)))

    index.children(HeuristicIndex.Root).foreach(push)

    while (nTaken < k && heap.nonEmpty) {
      val best = heap.dequeue()
      result += best.repr
      nTaken += 1
      index.children(best.repr).foreach(push)
    }
    result.result()
  }

  /** Hierarchy cleanup (paper §3.2): drop candidates whose coverage adds
    * no sentence beyond the already-discovered positives (C_r ⊆ P).
    */
  def cleanup(index: HeuristicIndex, pos: java.util.BitSet,
              candidates: Vector[String]): Vector[String] =
    candidates.filter(p => index.posCount(p, pos) < index.count(p))
}
