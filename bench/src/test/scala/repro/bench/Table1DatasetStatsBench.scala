package repro.bench

import repro.SparkSpec
import repro.data.{CorpusGen, Datasets}
import repro.eval.Experiments

/** Table 1 reproduction: dataset statistics at the paper's sizes, computed
  * through the Spark generation dataflow (professions at 1M sentences).
  * Paper values: cause-effect 10.7K/12.2%, musicians 15.8K/10%,
  * directions 15.3K/3.8%, professions 1M/1.1%, tweets 2130/11.4%.
  */
class Table1DatasetStatsBench extends SparkSpec {

  test("Table 1: dataset statistics match the paper") {
    val rows = Datasets.all.map { spec =>
      val df = CorpusGen.corpus(spark, spec, Some(BenchCorpora.sizeOf(spec))).toDF()
      val (n, rate) = CorpusGen.stats(df)
      (spec, n, rate)
    }
    println("\n=== Table 1: dataset statistics ===")
    println(Experiments.renderTable(
      Seq("dataset", "# Sentences", "% Positives", "Labeling"),
      rows.map { case (spec, n, rate) =>
        Seq(spec.name, n.toString, f"${100 * rate}%.1f", spec.labeling)
      }))

    if (BenchCorpora.scale >= 1.0) {
      val byName = rows.map { case (s, n, r) => s.name -> ((n, r)) }.toMap
      assert(byName("cause-effect")._1 === 10700L)
      assert(byName("musicians")._1 === 15800L)
      assert(byName("directions")._1 === 15300L)
      assert(byName("professions")._1 === 1000000L)
      assert(byName("tweets")._1 === 2130L)
      for ((spec, _, rate) <- rows)
        assert(math.abs(rate - spec.posRate) < 0.02,
          s"${spec.name}: rate=$rate expected ~${spec.posRate}")
    }
  }
}
