package repro.jobs

import repro.data.{CorpusGen, Datasets}
import repro.eval.Experiments

/** Table 1 — dataset statistics. Generates every evaluation corpus at the
  * paper's size through the Spark dataflow and reports sentence counts,
  * positive rates, and labeling task.
  *
  * spark-submit --class repro.jobs.Table1DatasetStats repro.jar [--scale s]
  */
object Table1DatasetStats {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table1-dataset-stats")
    val scale = JobSession.scaleOf(args)
    val rows = Datasets.all.map { spec =>
      val df = CorpusGen.corpus(spark, spec, JobSession.scaled(spec.n, scale)).toDF()
      val (n, rate) = CorpusGen.stats(df)
      Seq(spec.name, n.toString, f"${100 * rate}%.1f", spec.labeling)
    }
    println("Table 1: dataset statistics (paper: counts 10.7K/15.8K/15.3K/1M/2130; " +
            "positives 12.2/10/3.8/1.1/11.4%)")
    println(Experiments.renderTable(
      Seq("dataset", "# Sentences", "% Positives", "Labeling"), rows))
    spark.stop()
  }
}
