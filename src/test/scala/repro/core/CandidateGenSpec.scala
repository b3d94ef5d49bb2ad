package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.index.{HeuristicIndex, IndexEntry}

class CandidateGenSpec extends AnyFunSuite {

  /** Handcrafted index:
    *   G:a (0..5)  >  G:a b (0..3)  >  G:a b c (0,1)
    *   G:x (6..9)  >  G:x y (6,7)
    */
  private val idx = HeuristicIndex.fromEntries(10, Map(
    "G:a"     -> IndexEntry("G:a", 6, Array(0, 1, 2, 3, 4, 5)),
    "G:a b"   -> IndexEntry("G:a b", 4, Array(0, 1, 2, 3)),
    "G:a b c" -> IndexEntry("G:a b c", 2, Array(0, 1)),
    "G:b"     -> IndexEntry("G:b", 4, Array(0, 1, 2, 3)),
    "G:b c"   -> IndexEntry("G:b c", 2, Array(0, 1)),
    "G:c"     -> IndexEntry("G:c", 2, Array(0, 1)),
    "G:x"     -> IndexEntry("G:x", 4, Array(6, 7, 8, 9)),
    "G:x y"   -> IndexEntry("G:x y", 2, Array(6, 7)),
    "G:y"     -> IndexEntry("G:y", 2, Array(6, 7)),
  ))

  private def bits(is: Int*): java.util.BitSet = {
    val b = new java.util.BitSet(10); is.foreach(b.set); b
  }

  test("greedy picks the candidate with most coverage over P first") {
    val got = CandidateGen.generate(idx, bits(0, 1, 2, 3), 3)
    assert(got.head === "G:a") // posCount 4, count 6 beats G:b (4,4) on count
  }

  test("children of the selected candidate join the pool") {
    val got = CandidateGen.generate(idx, bits(0, 1, 2, 3), 9)
    assert(got.contains("G:a b"))
    assert(got.contains("G:a b c"))
  }

  test("generates exactly k candidates when available") {
    assert(CandidateGen.generate(idx, bits(0), 4).length === 4)
  }

  test("returns fewer than k when the index is exhausted") {
    val got = CandidateGen.generate(idx, bits(0), 100)
    assert(got.length === idx.entries.size)
    assert(got.distinct.length === got.length)
  }

  test("empty P still yields candidates (count tie-break)") {
    val got = CandidateGen.generate(idx, bits(), 2)
    assert(got.nonEmpty)
    // with all posCounts 0, highest total coverage wins
    assert(got.head === "G:a")
  }

  test("disjoint-cluster candidates are still reachable") {
    val got = CandidateGen.generate(idx, bits(6, 7), 9)
    assert(got.head === "G:x")
    assert(got.contains("G:x y"))
  }

  test("cleanup drops candidates fully inside P") {
    val p = bits(0, 1)
    val kept = CandidateGen.cleanup(idx, p, Vector("G:a", "G:a b c", "G:c"))
    assert(kept === Vector("G:a")) // G:a b c and G:c are ⊆ P
  }

  test("cleanup keeps candidates with any fresh coverage") {
    val kept = CandidateGen.cleanup(idx, bits(0), Vector("G:a b c", "G:x y"))
    assert(kept === Vector("G:a b c", "G:x y"))
  }

  test("determinism: same inputs give same candidate order") {
    val a = CandidateGen.generate(idx, bits(0, 1, 6), 9)
    val b = CandidateGen.generate(idx, bits(0, 1, 6), 9)
    assert(a === b)
  }
}
