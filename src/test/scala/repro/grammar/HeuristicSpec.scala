package repro.grammar

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets
import repro.grammar.Heuristic._
import repro.text.Pipeline

class HeuristicSpec extends AnyFunSuite {

  private val sent = Pipeline.parse("what is the best way to get to the airport")
  private val job  = Pipeline.parse("his job is a teacher")

  // ---------------------------------------------------------- phrases

  test("phrase matches a contained slice") {
    assert(Phrase(Vector("best", "way", "to")).matches(sent))
  }

  test("phrase does not match a non-contiguous subsequence") {
    assert(!Phrase(Vector("best", "to")).matches(sent))
  }

  test("single-word phrase matches token presence") {
    assert(Phrase(Vector("airport")).matches(sent))
    assert(!Phrase(Vector("hotel")).matches(sent))
  }

  test("phrase parents drop one token from either end") {
    val ps = Phrase(Vector("best", "way", "to")).parents.map(_.repr).toSet
    assert(ps === Set("G:best way", "G:way to"))
  }

  test("single-word phrase has no parents (root child)") {
    assert(Phrase(Vector("way")).parents.isEmpty)
  }

  // ---------------------------------------------------------- terms and tree patterns

  test("TermPat token/pos matching") {
    assert(TermPat(Term.Tok("airport")).matches(sent))
    assert(TermPat(Term.Pos("AUX")).matches(sent))
    assert(!TermPat(Term.Tok("pizza")).matches(sent))
  }

  test("ChildPat matches a direct dependency edge") {
    // 'to the airport': airport attaches to 'to'
    assert(ChildPat(Term.Tok("to"), Term.Tok("airport")).matches(sent))
    assert(!ChildPat(Term.Tok("airport"), Term.Tok("to")).matches(sent))
  }

  test("DescPat matches within the distance bound and implies ChildPat coverage") {
    assert(DescPat(Term.Tok("to"), Term.Tok("airport")).matches(sent))
    val root = sent.heads.indexOf(-1)
    val tok  = Term.Tok(sent.tokens(root))
    // every child of the root is also a bounded descendant
    for (c <- sent.children(root)) {
      assert(DescPat(tok, Term.Tok(sent.tokens(c))).matches(sent))
    }
  }

  test("AndPat requires two distinct nodes") {
    assert(AndPat.canonical(Term.Tok("best"), Term.Tok("airport")).matches(sent))
    // 'airport' appears once: A(airport, airport) must NOT match
    assert(!AndPat(Term.Tok("airport"), Term.Tok("airport")).matches(sent))
    // but 'to' appears twice
    assert(AndPat(Term.Tok("to"), Term.Tok("to")).matches(sent))
  }

  test("AndPat canonical ordering swaps as needed") {
    val a = AndPat.canonical(Term.Tok("zebra"), Term.Tok("ant"))
    assert(a.repr === "T:A(t=ant,t=zebra)")
  }

  test("Child2Pat matches the paper's /is/NOUN∧job shape") {
    val h = Child2Pat.canonical(Term.Tok("is"), Term.Pos("NOUN"), Term.Tok("job"))
    assert(h.matches(job))
  }

  test("Child2Pat requires two distinct children") {
    // 'is' has exactly one child named 'job'; C2(is, job, job) must fail
    val h = Child2Pat(Term.Tok("is"), Term.Tok("job"), Term.Tok("job"))
    assert(!h.matches(job))
  }

  // ---------------------------------------------------------- parse/repr roundtrip

  test("repr/parse roundtrip for every heuristic type") {
    val hs: Seq[Heuristic] = Seq(
      Phrase(Vector("best", "way", "to")),
      Phrase(Vector("shuttle")),
      TermPat(Term.Tok("bart")),
      TermPat(Term.Pos("NOUN")),
      ChildPat(Term.Tok("to"), Term.Pos("NOUN")),
      DescPat(Term.Pos("VERB"), Term.Tok("airport")),
      AndPat.canonical(Term.Tok("a"), Term.Tok("b")),
      Child2Pat.canonical(Term.Tok("is"), Term.Pos("NOUN"), Term.Tok("job")),
    )
    for (h <- hs) assert(Heuristic.parse(h.repr) === h, h.repr)
  }

  test("parse rejects malformed strings") {
    intercept[IllegalArgumentException](Heuristic.parse("X:whatever"))
    intercept[IllegalArgumentException](Heuristic.parse("T:q=bad"))
  }

  // ---------------------------------------------------------- parent/subset invariant

  test("parents relation: if h matches, every parent matches (subset invariant)") {
    val sentences = for {
      spec <- Datasets.all
      id   <- 0L until 120L
    } yield Pipeline.parse(spec.sentence(id)._1)
    var checked = 0
    for (p <- sentences; pat <- SketchExtractor.patterns(p)) {
      val h = Heuristic.parse(pat)
      assert(h.matches(p), s"extracted pattern $pat must match its own sentence")
      for (par <- h.parents) {
        assert(par.matches(p),
          s"parent ${par.repr} of $pat must match '${p.tokens.mkString(" ")}'")
        checked += 1
      }
    }
    assert(checked > 1000)
  }

  test("parent chains terminate (no infinite generalization)") {
    val h: Heuristic = Child2Pat.canonical(Term.Tok("is"), Term.Pos("NOUN"), Term.Tok("job"))
    var frontier: Set[Heuristic] = Set(h)
    var steps = 0
    while (frontier.nonEmpty && steps < 10) {
      frontier = frontier.flatMap(_.parents)
      steps += 1
    }
    assert(frontier.isEmpty, "chain should reach parentless terminals")
  }
}
