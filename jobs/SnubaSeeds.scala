package repro.jobs

import repro.core.PreparedCorpus
import repro.data.Datasets
import repro.eval.Experiments

/** Fig. 7/8 — fraction of positives identified vs labeled-seed size, for
  * Darwin(HS) and the Snuba baseline, with unbiased and biased seeds (the
  * biased sample excludes sentences containing 'shuttle' / 'composer').
  *
  * spark-submit --class repro.jobs.SnubaSeeds repro.jar [--scale s]
  */
object SnubaSeeds {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("snuba-seeds")
    val scale = JobSession.scaleOf(args)
    val seedSizes = Seq(10, 25, 100, 200, 1000)
    for (spec <- Seq(Datasets.directions, Datasets.musicians)) {
      val prep = PreparedCorpus.prepare(spark, spec, JobSession.scaled(spec.n, scale))
      for (biased <- Seq(false, true)) {
        val rows = Experiments.snubaComparison(prep, seedSizes, budget = 100, biased = biased)
        println(s"\n${spec.name} (${if (biased) "biased" else "random"} seed) — " +
                "fraction of positives identified:")
        println(Experiments.renderTable(
          Seq("seed size", "Darwin(HS)", "Snuba"),
          rows.map(r => Seq(r.seedSize.toString,
                            f"${r.darwinRecall}%.2f", f"${r.snubaRecall}%.2f"))))
      }
    }
    spark.stop()
  }
}
