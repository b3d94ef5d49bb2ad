package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.eval.Experiments

/** Fig. 9 (e–h) reproduction: F-score of the end classifier at a fixed
  * query budget, Darwin pipelines vs active learning (AL) and keyword
  * sampling (KS). Paper shape: Darwin(HS) dominates AL and KS. In our
  * substrate the separation is driven by class imbalance (AL cannot find
  * enough positives with ~100 labels): it is large on the imbalanced
  * datasets (directions 3.8%, professions 1.1%) and shrinks on the ~10%-
  * positive datasets where our LR substitute is more sample-efficient than
  * the paper's CNN (recorded in EXPERIMENTS.md).
  */
class ClassifierQualityBench extends SparkSpec {

  test("Fig 9 (F-score): Darwin(HS) beats AL and KS at budget 100") {
    val specs = Seq(Datasets.causeEffect, Datasets.musicians,
                    Datasets.directions, Datasets.tweets, Datasets.professions)
    val methods = Seq("Darwin(HS)", "Darwin(US)", "Darwin(LS)", "Darwin(HighP)", "AL", "KS")
    val rows = specs.map { spec =>
      val prep = BenchCorpora.prepared(spark, spec)
      val q = Experiments.classifierQuality(prep, spec, budget = 100)
      spec.name -> q.map(r => r.method -> r.f1).toMap
    }
    println("\n=== Fig 9 F-score at budget 100 ===")
    println(Experiments.renderTable(
      "dataset" +: methods,
      rows.map { case (n, m) => n +: methods.map(k => f"${m.getOrElse(k, 0.0)}%.2f") }))

    if (BenchCorpora.scale < 1.0) cancel("shape assertions need full scale")
    for ((name, m) <- rows) {
      assert(m("Darwin(HS)") >= m("AL") - 0.05, s"$name: HS ${m("Darwin(HS)")} vs AL ${m("AL")}")
      assert(m("Darwin(HS)") >= m("KS") - 0.02, s"$name: HS ${m("Darwin(HS)")} vs KS ${m("KS")}")
      assert(m("Darwin(HS)") > 0.6, s"$name: HS F1 ${m("Darwin(HS)")}")
    }
    // imbalanced regimes: the paper's separation must be clear
    val byName = rows.toMap
    for (name <- Seq("directions", "professions")) {
      val m = byName(name)
      assert(m("Darwin(HS)") > m("AL") + 0.15, s"$name: HS ${m("Darwin(HS)")} vs AL ${m("AL")}")
      assert(m("Darwin(HS)") > m("KS") + 0.15, s"$name: HS ${m("Darwin(HS)")} vs KS ${m("KS")}")
    }
  }
}
