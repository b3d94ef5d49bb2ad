package repro.core

import org.apache.spark.sql.SparkSession
import repro.data.{CorpusGen, DatasetSpec}
import repro.grammar.SketchConfig
import repro.index.HeuristicIndex
import repro.text.{Embeddings, Pipeline}

/** Driver-side view of a prepared corpus: the pruned heuristic index, the
  * per-sentence embedding features, and the hidden ground truth (used only
  * by oracle simulation and evaluation).
  *
  * All corpus-size-proportional work (generation, parsing, sketch
  * extraction, index aggregation, feature extraction) runs as Spark
  * dataflow in [[PreparedCorpus.prepare]]; the interactive Darwin loop then
  * operates on this compact driver-side structure — mirroring the paper's
  * split between the scalable index-construction phase and the annotator
  * loop (§3.1, §4.5).
  */
final class PreparedCorpus(
    val name: String,
    val n: Int,
    val index: HeuristicIndex,
    val features: Array[Array[Float]],
    val gt: java.util.BitSet,
) {
  val nPos: Int = gt.cardinality()

  /** Recall of a discovered positive set: |P ∩ GT| / |GT|. */
  def recall(p: java.util.BitSet): Double = {
    if (nPos == 0) return 0.0
    val both = p.clone().asInstanceOf[java.util.BitSet]
    both.and(gt)
    both.cardinality().toDouble / nPos
  }

  /** Fraction of P that is truly positive. */
  def precisionOf(p: java.util.BitSet): Double = {
    val c = p.cardinality()
    if (c == 0) return 0.0
    val both = p.clone().asInstanceOf[java.util.BitSet]
    both.and(gt)
    both.cardinality().toDouble / c
  }

  /** Ground-truth positive ids (for seed-sampling experiments). */
  lazy val positiveIds: Array[Int] = Classifier.bitsetIndices(gt)
}

object PreparedCorpus {

  /** Generate, parse, feature-extract and index a dataset through Spark. */
  def prepare(spark: SparkSession, spec: DatasetSpec,
              nOverride: Option[Long] = None,
              cfg: SketchConfig = SketchConfig(),
              minCover: Option[Int] = None,
              maxCoverFrac: Double = 0.2): PreparedCorpus = {
    import spark.implicits._
    val corpus = CorpusGen.corpus(spark, spec, nOverride)
    val n      = nOverride.getOrElse(spec.n).toInt

    val index = HeuristicIndex.build(spark, corpus, cfg, minCover, maxCoverFrac)

    val rows = corpus.map { r =>
      val p = Pipeline.parse(r.text)
      (r.id, r.label, Embeddings.features(p.tokens, p.pos))
    }.collect()

    val features = new Array[Array[Float]](n)
    val gt       = new java.util.BitSet(n)
    for ((id, label, vec) <- rows) {
      features(id.toInt) = vec
      if (label == 1) gt.set(id.toInt)
    }
    new PreparedCorpus(spec.name, n, index, features, gt)
  }
}
