package repro.weak

import repro.core.PreparedCorpus

/** Snorkel substitute (DESIGN.md substitution 5): the one-coin generative
  * label model over positive-voting labeling functions, fitted with EM.
  *
  * Snorkel-faithful semantics: a labeling function that does not fire
  * ABSTAINS — it contributes no evidence (modelling absence as negative
  * evidence collapses under disjoint rule families and a skewed class
  * prior: a single precise rule could never push a sentence past 0.5).
  * Each rule j has an accuracy a_j = P(vote correct | it fires); with the
  * class balance π the posterior of a covered sentence is
  *   P(y=1 | votes) ∝ π · Π_{j fires} a_j   vs   (1-π) · Π_{j fires} (1-a_j).
  * Snorkel's default balanced prior (π = 0.5) is used. Uncovered sentences
  * get no label (posterior 0) — they are not part of the de-noised
  * training positives, exactly as Snorkel drops uncovered examples.
  */
object LabelModel {

  final case class Fit(
      posterior: Array[Double],      // P(y=1 | votes); 0 for uncovered
      accuracyByRule: Array[Double], // a_j
      prior: Double,                 // π (class balance)
  )

  /** @param coverages inverted lists (sorted sentence ids) of each rule
    * @param n corpus size
    */
  def fit(coverages: Vector[Array[Int]], n: Int,
          iters: Int = 25, prior: Double = 0.5): Fit = {
    val m = coverages.length
    require(m > 0, "need at least one labeling function")

    val covered = Array.fill(n)(List.empty[Int])
    for (j <- 0 until m; s <- coverages(j)) covered(s) ::= j

    val a = Array.fill(m)(0.7) // accuracy when firing
    val q = new Array[Double](n)

    def clamp(x: Double, lo: Double = 1e-6, hi: Double = 1 - 1e-6): Double =
      math.max(lo, math.min(hi, x))

    val logPrior = math.log(clamp(prior)) - math.log(clamp(1 - prior))
    var it = 0
    while (it < iters) {
      // E-step over covered sentences only (abstains carry no evidence)
      var s = 0
      while (s < n) {
        var cs = covered(s)
        if (cs.isEmpty) q(s) = 0.0
        else {
          var logit = logPrior
          while (cs.nonEmpty) {
            val j = cs.head
            logit += math.log(clamp(a(j))) - math.log(clamp(1 - a(j)))
            cs = cs.tail
          }
          q(s) = 1.0 / (1.0 + math.exp(-logit))
        }
        s += 1
      }
      // M-step: accuracy = expected fraction of correct firings
      var j = 0
      while (j < m) {
        val ids = coverages(j)
        if (ids.nonEmpty) {
          var cq = 0.0; var i = 0
          while (i < ids.length) { cq += q(ids(i)); i += 1 }
          a(j) = clamp(cq / ids.length, 0.05, 0.95)
        }
        j += 1
      }
      it += 1
    }
    Fit(q, a, prior)
  }

  /** De-noised positive set: covered sentences with posterior ≥ threshold. */
  def denoise(prep: PreparedCorpus, ruleCoverages: Vector[Array[Int]],
              threshold: Double = 0.5): java.util.BitSet = {
    val fitted = fit(ruleCoverages, prep.n)
    val out    = new java.util.BitSet(prep.n)
    var i = 0
    while (i < prep.n) {
      if (fitted.posterior(i) >= threshold) out.set(i)
      i += 1
    }
    out
  }
}
