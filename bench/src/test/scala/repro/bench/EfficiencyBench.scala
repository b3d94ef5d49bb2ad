package repro.bench

import org.apache.spark.sql.functions.col
import repro.SparkSpec
import repro.core.{Darwin, ExactOracle, Strategy}
import repro.data.{CorpusGen, Datasets}
import repro.eval.Metrics
import repro.weak.RuleApply

/** §4.5 efficiency reproduction: the full distributed dataflow over the
  * 1M-sentence professions corpus — generation, parsing, sketch
  * extraction, index aggregation (Spark), the Darwin(HS) loop (driver),
  * and distributed rule application producing weak labels.
  *
  * Paper reference points: index construction < 5 min; end-to-end label
  * generation for a 1M corpus < 3 h (65 min with their score-caching
  * optimization). Our per-phase wall times are recorded in EXPERIMENTS.md.
  */
class EfficiencyBench extends SparkSpec {

  test("Efficiency: 1M-sentence professions corpus end-to-end") {
    val spec = Datasets.professions
    val n = BenchCorpora.sizeOf(spec)

    def timed[A](what: String)(f: => A): (A, Double) = {
      val t0 = System.nanoTime()
      val r  = f
      val s  = (System.nanoTime() - t0) / 1e9
      println(f"[efficiency] $what: $s%.1f s")
      (r, s)
    }

    val (prep, tPrep) = timed(s"prepare (generate+parse+index, n=$n)") {
      BenchCorpora.prepared(spark, spec)
    }
    println(s"[efficiency] index patterns=${prep.index.entries.size}")

    val (res, tLoop) = timed("Darwin(HS) loop, budget 100") {
      val oracle = new ExactOracle(prep.gt)
      new Darwin(prep, oracle).run(spec.seedRule, budget = 100, Strategy.HybridSearch())
    }
    println(f"[efficiency] rules=${res.rules.size} queries=${res.queries} " +
            f"recall=${prep.recall(res.positives)}%.3f")

    val (nWeak, tApply) = timed("distributed weak-label application") {
      RuleApply.weakLabels(spark,
          CorpusGen.corpus(spark, spec, Some(n)), res.rules)
        .filter(col("weakLabel") === 1).count()
    }

    val (f1, tTrain) = timed("final classifier + corpus scoring") {
      Metrics.classifierF1(prep, res.positives).f1
    }
    val total = tPrep + tLoop + tApply + tTrain
    println(f"[efficiency] weakPositives=$nWeak classifierF1=$f1%.3f " +
            f"totalWall=${total / 60}%.1f min")

    assert(prep.recall(res.positives) > 0.6,
      s"recall ${prep.recall(res.positives)}")
    assert(nWeak > 0)
    if (BenchCorpora.scale >= 1.0) {
      // paper: index < 5 min on their 64-core server; allow headroom here
      assert(tPrep < 15 * 60, s"index build took $tPrep s")
      // paper: < 3 h end-to-end for 1M sentences
      assert(total < 3 * 3600, s"end-to-end took $total s")
    }
  }
}
