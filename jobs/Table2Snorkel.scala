package repro.jobs

import repro.core.PreparedCorpus
import repro.data.Datasets
import repro.eval.Experiments

/** Table 2 — F-score of a classifier trained directly on Darwin(HS) labels
  * vs on labels de-noised by the Snorkel-substitute label model, on
  * musicians (M), cause-effect (C), directions (D) and food-tweets (F).
  *
  * spark-submit --class repro.jobs.Table2Snorkel repro.jar [--scale s]
  */
object Table2Snorkel {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table2-snorkel")
    val scale = JobSession.scaleOf(args)
    val specs = Seq(Datasets.musicians, Datasets.causeEffect,
                    Datasets.directions, Datasets.tweets)
    val rows = specs.map { spec =>
      val prep = PreparedCorpus.prepare(spark, spec, JobSession.scaled(spec.n, scale))
      val row = Experiments.table2Row(prep, spec.seedRule, budget = 100)
      Seq(spec.name, f"${row.f1Darwin}%.2f", f"${row.f1Snorkel}%.2f")
    }
    println("Table 2: Darwin vs Darwin+Snorkel F-score " +
            "(paper: M 0.91/0.82, C 0.79/0.78, D 0.89/0.97, F 0.87/0.87)")
    println(Experiments.renderTable(Seq("dataset", "Darwin", "Darwin+Snorkel"), rows))
    spark.stop()
  }
}
