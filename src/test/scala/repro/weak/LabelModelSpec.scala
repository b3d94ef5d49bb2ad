package repro.weak

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Darwin, ExactOracle, Strategy}
import repro.{SparkSpec, TestCorpora}

class LabelModelFitSpec extends AnyFunSuite {

  test("covered sentences get higher posterior than uncovered ones") {
    val fit = LabelModel.fit(Vector(Array(0, 1, 2), Array(1, 2, 3)), 10)
    val covered = Seq(0, 1, 2, 3).map(fit.posterior)
    val uncovered = Seq(5, 6, 7).map(fit.posterior)
    assert(covered.min > uncovered.max)
  }

  test("multiply-covered sentences get the highest posterior") {
    val fit = LabelModel.fit(Vector(Array(0, 1), Array(1, 2), Array(1, 3)), 12)
    assert(fit.posterior(1) >= fit.posterior(0))
    assert(fit.posterior(1) >= fit.posterior(2))
  }

  test("posteriors are valid probabilities") {
    val fit = LabelModel.fit(Vector(Array(0, 1, 2), Array(4, 5)), 8)
    assert(fit.posterior.forall(p => p >= 0.0 && p <= 1.0))
    assert(fit.prior > 0.0 && fit.prior < 1.0)
  }

  test("a rule disjoint from all others is downweighted relative to corroborated rules") {
    // rules 1..3 heavily overlap; rule 4 fires alone on different sentences
    val fit = LabelModel.fit(Vector(
      Array(0, 1, 2, 3), Array(0, 1, 2, 4), Array(1, 2, 3, 4),
      Array(10, 11, 12, 13)), 20)
    val corroborated = Seq(1, 2).map(fit.posterior).min
    val lone = Seq(10, 11).map(fit.posterior).max
    assert(corroborated >= lone - 1e-9)
  }

  test("single labeling function is accepted") {
    val fit = LabelModel.fit(Vector(Array(2, 3)), 5)
    assert(fit.posterior(2) > fit.posterior(0))
  }

  test("empty rule set is rejected") {
    intercept[IllegalArgumentException](LabelModel.fit(Vector.empty, 4))
  }

  test("EM is deterministic") {
    val covs = Vector(Array(0, 1, 2), Array(2, 3))
    val a = LabelModel.fit(covs, 6)
    val b = LabelModel.fit(covs, 6)
    assert(a.posterior.toSeq === b.posterior.toSeq)
  }
}

class LabelModelEndToEndSpec extends SparkSpec {

  test("denoise keeps the bulk of Darwin's positives and does not hurt precision much") {
    val prep = TestCorpora.tweetsSmall(spark)
    val oracle = new ExactOracle(prep.gt)
    val res = new Darwin(prep, oracle).run("G:craving", 50, Strategy.HybridSearch())
    val denoised = LabelModel.denoise(prep, res.rules.map(prep.index.ids))
    assert(denoised.cardinality() > 0)
    val before = prep.precisionOf(res.positives)
    val after  = prep.precisionOf(denoised)
    assert(after >= before - 0.1, s"denoise precision $after vs $before")
  }
}
