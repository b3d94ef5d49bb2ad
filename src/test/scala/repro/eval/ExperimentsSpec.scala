package repro.eval

import repro.{SparkSpec, TestCorpora}
import repro.core.Strategy
import repro.data.Datasets

class ExperimentsSpec extends SparkSpec {

  test("table1Row reports size, rate, labeling") {
    val prep = TestCorpora.tweetsSmall(spark)
    val row = Experiments.table1Row(prep, Datasets.tweets)
    assert(row.name === "tweets")
    assert(row.sentences === 800L)
    assert(row.pctPositives > 5 && row.pctPositives < 20)
    assert(row.labeling === "Intents")
  }

  test("sampleSeed returns requested size with >= 2 positives") {
    val prep = TestCorpora.directionsSmall(spark)
    val s = Experiments.sampleSeed(prep, 20, 7)
    assert(s.length === 20 || s.length === 21 || s.length === 22) // + forced positives
    assert(s.count(_._2 == 1) >= 2)
    assert(s.map(_._1).distinct.length === s.length)
  }

  test("sampleSeed labels agree with ground truth") {
    val prep = TestCorpora.tweetsSmall(spark)
    for ((i, l) <- Experiments.sampleSeed(prep, 50, 8))
      assert(l === (if (prep.gt.get(i)) 1 else 0))
  }

  test("biased sampleSeed excludes sentences with the token") {
    val prep = TestCorpora.directionsSmall(spark)
    val shuttleIds = prep.index.ids("T:t=shuttle").toSet
    val s = Experiments.sampleSeed(prep, 100, 9, excludeToken = Some("shuttle"))
    assert(s.forall { case (i, _) => !shuttleIds.contains(i) })
  }

  test("snubaComparison: Darwin dominates Snuba at small seeds (Fig. 7 shape)") {
    val prep = TestCorpora.directionsSmall(spark)
    val rows = Experiments.snubaComparison(prep, Seq(10, 200), budget = 60, biased = false)
    assert(rows.size === 2)
    val small = rows.head
    assert(small.darwinRecall > small.snubaRecall,
      s"darwin=${small.darwinRecall} snuba=${small.snubaRecall}")
    assert(small.darwinRecall > 0.5)
  }

  test("strategySweep returns one run per strategy with curves") {
    val prep = TestCorpora.tweetsSmall(spark)
    val runs = Experiments.strategySweep(prep, "G:craving", 30,
      Seq(Strategy.HybridSearch(), Strategy.LocalSearch))
    assert(runs.map(_.strategy) === Vector("HS", "LS"))
    for (r <- runs) {
      assert(r.curve.nonEmpty)
      assert(r.finalRecall >= 0.0 && r.finalRecall <= 1.0)
      assert(r.curve.last._2 === r.finalRecall)
    }
  }

  test("table2Row produces two F-scores on tweets") {
    val prep = TestCorpora.tweetsSmall(spark)
    val row = Experiments.table2Row(prep, "G:craving", budget = 50)
    assert(row.f1Darwin > 0.5, s"f1Darwin=${row.f1Darwin}")
    assert(row.f1Snorkel > 0.4, s"f1Snorkel=${row.f1Snorkel}")
  }

  test("runDarwin honors a custom DarwinConfig") {
    val prep = TestCorpora.tweetsSmall(spark)
    val res = Experiments.runDarwin(prep, "G:craving", 10, Strategy.HybridSearch(),
      repro.core.DarwinConfig(k = 50))
    assert(res.queries <= 10)
  }
}
