package repro.jobs

import repro.core.PreparedCorpus
import repro.data.Datasets
import repro.eval.Experiments

/** Fig. 9 (a–d) — progressive rule coverage (fraction of positives) per
  * hierarchy-traversal strategy (LS, US, HS, HighP) on four datasets.
  *
  * spark-submit --class repro.jobs.RuleCoverage repro.jar [--scale s]
  */
object RuleCoverage {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("rule-coverage")
    val scale = JobSession.scaleOf(args)
    val specs = Seq(Datasets.causeEffect, Datasets.musicians,
                    Datasets.directions, Datasets.tweets)
    for (spec <- specs) {
      val prep = PreparedCorpus.prepare(spark, spec, JobSession.scaled(spec.n, scale))
      val runs = Experiments.strategySweep(prep, spec.seedRule, budget = 150)
      println(s"\n${spec.name} — coverage after b queries:")
      val checkpoints = Seq(0, 25, 50, 100, 150)
      def at(curve: Vector[(Int, Double)], q: Int): Double =
        curve.filter(_._1 <= q).lastOption.map(_._2).getOrElse(0.0)
      println(Experiments.renderTable(
        "strategy" +: checkpoints.map(c => s"b=$c"),
        runs.map(r => r.strategy +: checkpoints.map(c => f"${at(r.curve, c)}%.2f"))))
    }
    spark.stop()
  }
}
