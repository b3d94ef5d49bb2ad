package repro.core

import scala.collection.mutable

/** Hierarchy-traversal strategy (paper §3.3–3.6 and the §4.3 baselines). */
sealed trait Strategy { def label: String }
object Strategy {
  /** Alg. 3: explore parents/children of confirmed rules. */
  case object LocalSearch extends Strategy { val label = "LS" }
  /** Alg. 4: best global benefit, skipping rules with avg benefit ≤ 0.5. */
  case object UniversalSearch extends Strategy { val label = "US" }
  /** Alg. 5: toggle between the two after τ consecutive failures. */
  final case class HybridSearch(tau: Int = 5) extends Strategy { val label = "HS" }
  /** §4.3 baseline: query the rule with highest expected precision. */
  case object HighP extends Strategy { val label = "HighP" }
  /** §4.3 baseline: query the rule with highest coverage. */
  case object HighC extends Strategy { val label = "HighC" }
}

final case class DarwinConfig(
    k: Int = 10000,                                  // candidates per hierarchy generation (paper: 10K)
    minAvgBenefit: Double = 0.5,                     // Alg. 4/5 per-instance benefit cutoff
    maxAskedJaccard: Double = 0.8,                   // §3.2 diversity: skip near-duplicates of asked rules
    classifier: Classifier.Config = Classifier.Config(),
    seed: Long = 42,
)

/** One oracle interaction: the rule asked, the answer, and the state of
  * the discovered positive set afterwards.
  */
final case class QueryEvent(query: Int, rule: String, answer: Boolean,
                            pSize: Int, recall: Double)

final case class DarwinResult(
    rules: Vector[String],
    positives: java.util.BitSet,
    trace: Vector[QueryEvent],
    model: Model,
) {
  def queries: Int = trace.length
  /** recall after each query, prefixed with the post-seed state at x=0. */
  def recallCurve(seedRecall: Double): Vector[(Int, Double)] =
    (0, seedRecall) +: trace.map(e => (e.query, e.recall))
  def finalRecall: Double = trace.lastOption.map(_.recall).getOrElse(0.0)
}

/** The Darwin driver (paper Algorithm 1): seed → iterate (candidate
  * generation → hierarchy traversal → oracle query → score update).
  *
  * Implementation notes (see DESIGN.md "Paper deviations"):
  *  - Alg. 4 line 10 typo corrected to `R ← R ∪ {r}, P ← P ∪ C_r`;
  *  - the budget counts oracle queries only — the UniversalSearch
  *    `avgBenefit ≤ 0.5` skip removes the rule without consuming budget;
  *  - HybridSearch's failure counter resets on a YES (the paper's stated
  *    intent: switch after τ *unsuccessful* attempts).
  */
final class Darwin(prep: PreparedCorpus, oracle: RuleOracle,
                   cfg: DarwinConfig = DarwinConfig()) {

  /** Run from a seed labeling rule (must be indexed — i.e. have corpus
    * support within the index bounds).
    */
  def run(seedRule: String, budget: Int, strategy: Strategy): DarwinResult = {
    require(prep.index.contains(seedRule),
            s"seed rule '$seedRule' not in index for ${prep.name}")
    runLoop(Some(seedRule), prep.index.ids(seedRule), budget, strategy)
  }

  /** Run from a couple of labeled positive sentences instead of a rule. */
  def runFromPositives(seedIds: Array[Int], budget: Int, strategy: Strategy): DarwinResult =
    runLoop(None, seedIds, budget, strategy)

  // ------------------------------------------------------------------

  private def runLoop(seedRule: Option[String], seedIds: Array[Int],
                      budget: Int, strategy: Strategy): DarwinResult = {
    val index = prep.index
    val n     = prep.n

    val P = new java.util.BitSet(n)
    seedIds.foreach(P.set)
    val R     = mutable.ArrayBuffer.empty[String]
    seedRule.foreach(R += _)
    val asked = mutable.HashSet.empty[String]
    seedRule.foreach(asked += _) // the seed is pre-verified; never re-ask
    val trace = Vector.newBuilder[QueryEvent]

    var retrains = 0
    var model  = Model(new Array[Double](0), 0.0)
    var scores = new Array[Double](n)
    def retrain(): Unit = {
      model = Classifier.trainOnPositives(prep.features, P, n,
                                          cfg.seed + retrains, cfg.classifier)
      scores = Classifier.scoreAll(prep.features, model)
      retrains += 1
    }
    retrain()

    // benefit(r) = Σ_{s ∈ C_r \ P} p_s  (§3.3). Memoized: P and the scores
    // only change on an accepted rule (the cache is cleared there), while
    // pick() re-evaluates the whole pool every iteration.
    val statsCache = mutable.HashMap.empty[String, (Double, Int)]
    def stats(p: String): (Double, Int) = statsCache.getOrElseUpdate(p, {
      val ids = index.ids(p)
      var benefit = 0.0; var fresh = 0; var i = 0
      while (i < ids.length) {
        if (!P.get(ids(i))) { benefit += scores(ids(i)); fresh += 1 }
        i += 1
      }
      (benefit, fresh)
    })
    def avgBenefit(p: String): Double = {
      val (b, f) = stats(p); if (f == 0) 0.0 else b / f
    }
    def freshCount(p: String): Int = stats(p)._2
    // §3.2 cleanup applied to live pools: a rule whose coverage is inside P
    // cannot add positives — drop it without spending an oracle query.
    def prune(pool: mutable.LinkedHashSet[String]): Unit =
      pool.filterInPlace(p => freshCount(p) > 0)

    // §3.2 diversity constraint: never spend a query on a rule whose
    // coverage is nearly identical to one already answered — the oracle
    // would give the same answer ("avoid having to evaluate many similar
    // candidate heuristics").
    val askedCoverages = mutable.ArrayBuffer.empty[Array[Int]]
    def jaccard(a: Array[Int], b: Array[Int]): Double = {
      var i = 0; var j = 0; var inter = 0
      while (i < a.length && j < b.length) {
        if (a(i) == b(j)) { inter += 1; i += 1; j += 1 }
        else if (a(i) < b(j)) i += 1
        else j += 1
      }
      val union = a.length + b.length - inter
      if (union == 0) 0.0 else inter.toDouble / union
    }
    def redundant(p: String): Boolean = {
      val ids = index.ids(p)
      askedCoverages.exists(jaccard(ids, _) >= cfg.maxAskedJaccard)
    }

    def regen(): mutable.LinkedHashSet[String] =
      mutable.LinkedHashSet.from(
        CandidateGen.cleanup(index, P, CandidateGen.generate(index, P, cfg.k))
          .filterNot(asked))

    /** argmax over a candidate pool with deterministic tie-breaking. */
    def pick(pool: Iterable[String], key: String => (Double, Double)): Option[String] =
      pool.foldLeft(Option.empty[(String, (Double, Double))]) { (best, p) =>
        val k = key(p)
        best match {
          case Some((bp, bk))
            if bk._1 > k._1 || (bk._1 == k._1 && (bk._2 > k._2 ||
              (bk._2 == k._2 && bp <= p))) => best
          case _ => Some((p, k))
        }
      }.map(_._1)

    val byBenefit: String => (Double, Double) =
      p => { val (b, f) = stats(p); (b, f.toDouble) }
    val byAvgBenefit: String => (Double, Double) =
      p => { val (b, f) = stats(p); (if (f == 0) 0.0 else b / f, b) }
    val byCoverage: String => (Double, Double) =
      p => (index.count(p).toDouble, 0.0)

    def accept(r: String): Unit = {
      if (!R.contains(r)) R += r
      index.ids(r).foreach(P.set)
      retrain()
      statsCache.clear()
    }
    def askOracle(r: String): Boolean = {
      askedCoverages += index.ids(r)
      oracle.query(index.ids(r))
    }
    def record(r: String, answer: Boolean): Unit =
      trace += QueryEvent(oracle.queries, r, answer, P.cardinality(), prep.recall(P))

    val local     = mutable.LinkedHashSet.empty[String]
    seedRule.foreach(local += _)
    // Rule-less start: LocalSearch needs an anchor — use the indexed rule
    // with the highest coverage over the seed positives (generate_hierarchy
    // would surface it first anyway).
    if (seedRule.isEmpty)
      CandidateGen.generate(index, P, 1).foreach(local += _)
    var universal = regen()

    def addLocalParents(r: String): Unit =
      index.parents(r).filterNot(asked).foreach(local += _)
    def addLocalChildren(r: String): Unit =
      index.children(r).filterNot(asked).foreach(local += _)

    strategy match {
      case Strategy.LocalSearch =>
        // Alg. 3. The seed is pre-verified: expand its neighborhood directly.
        seedRule.foreach { r => local -= r; addLocalParents(r); addLocalChildren(r) }
        prune(local)
        while (oracle.queries < budget && local.nonEmpty) {
          val r = pick(local, byBenefit).get
          local -= r; asked += r
          if (!redundant(r)) {
            val yes = askOracle(r)
            if (yes) { accept(r); addLocalParents(r) } else addLocalChildren(r)
            record(r, yes)
          }
          prune(local)
        }

      case Strategy.UniversalSearch =>
        var continueLoop = true
        while (continueLoop && oracle.queries < budget && universal.nonEmpty) {
          val r = pick(universal, byBenefit).get
          if (avgBenefit(r) <= cfg.minAvgBenefit || redundant(r)) {
            universal -= r // skipped, no oracle cost (see DESIGN.md)
          } else {
            universal -= r; asked += r
            val yes = askOracle(r)
            if (yes) { accept(r); universal = regen() }
            record(r, yes)
          }
          continueLoop = universal.nonEmpty
        }

      case Strategy.HybridSearch(tau) =>
        seedRule.foreach { r => local -= r; addLocalParents(r); addLocalChildren(r) }
        var universalMode = true
        var attempt       = 0
        var exhausted     = 0
        while (oracle.queries < budget && exhausted < 2) {
          // τ consecutive *oracle failures* flip the mode (paper §3.6: the
          // number of unsuccessful attempts before the switch happens)
          if (attempt > tau) { universalMode = !universalMode; attempt = 0 }
          val pool = if (universalMode) universal else local
          prune(pool)
          if (pool.isEmpty) {
            universalMode = !universalMode; attempt = 0; exhausted += 1
          } else {
            exhausted = 0
            val r = pick(pool, byBenefit).get
            if (universalMode && avgBenefit(r) <= cfg.minAvgBenefit) {
              universal -= r // filtered, not an attempt and not a query
            } else if (redundant(r)) {
              universal -= r; local -= r; asked += r
            } else {
              universal -= r; local -= r; asked += r
              val yes = askOracle(r)
              if (yes) {
                attempt = 0
                accept(r); addLocalParents(r); universal = regen()
              } else { attempt += 1; addLocalChildren(r) }
              record(r, yes)
            }
          }
        }

      case Strategy.HighP =>
        while (oracle.queries < budget && universal.nonEmpty) {
          val r = pick(universal, byAvgBenefit).get
          universal -= r; asked += r
          if (!redundant(r)) {
            val yes = askOracle(r)
            if (yes) { accept(r); universal = regen() }
            record(r, yes)
          }
        }

      case Strategy.HighC =>
        while (oracle.queries < budget && universal.nonEmpty) {
          val r = pick(universal, byCoverage).get
          universal -= r; asked += r
          if (!redundant(r)) {
            val yes = askOracle(r)
            if (yes) { accept(r); universal = regen() }
            record(r, yes)
          }
        }
    }

    DarwinResult(R.toVector, P, trace.result(), model)
  }
}
