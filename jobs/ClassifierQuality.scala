package repro.jobs

import repro.core.PreparedCorpus
import repro.data.Datasets
import repro.eval.Experiments

/** Fig. 9 (e–h) — F-score of the classifier trained from each method's
  * labels at the same query budget: Darwin (HS/US/LS/HighP) vs active
  * learning (AL) and keyword sampling (KS).
  *
  * spark-submit --class repro.jobs.ClassifierQuality repro.jar [--scale s]
  */
object ClassifierQuality {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("classifier-quality")
    val scale = JobSession.scaleOf(args)
    val specs = Seq(Datasets.causeEffect, Datasets.musicians,
                    Datasets.directions, Datasets.tweets)
    val rows = specs.map { spec =>
      val prep = PreparedCorpus.prepare(spark, spec, JobSession.scaled(spec.n, scale))
      val q = Experiments.classifierQuality(prep, spec, budget = 100)
      spec.name -> q.map(r => r.method -> r.f1).toMap
    }
    val methods = Seq("Darwin(HS)", "Darwin(US)", "Darwin(LS)", "Darwin(HighP)", "AL", "KS")
    println("\nClassifier F-score at budget 100:")
    println(Experiments.renderTable(
      "dataset" +: methods,
      rows.map { case (name, m) => name +: methods.map(k => f"${m.getOrElse(k, 0.0)}%.2f") }))
    spark.stop()
  }
}
