package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SplitMix
import repro.text.Embeddings

class ClassifierSpec extends AnyFunSuite {

  /** Two separable clusters in 4d. */
  private def clusters(n: Int, seed: Long): (Array[Array[Float]], java.util.BitSet) = {
    val rng = new SplitMix(seed)
    val feats = new Array[Array[Float]](n)
    val gt = new java.util.BitSet(n)
    for (i <- 0 until n) {
      val pos = i % 2 == 0
      if (pos) gt.set(i)
      val base = if (pos) 1f else -1f
      feats(i) = Array.fill(4)(base + (rng.nextDouble().toFloat - 0.5f) * 0.4f)
    }
    (feats, gt)
  }

  test("learns a separable problem") {
    val (f, gt) = clusters(200, 1)
    val pos = (0 until 200).filter(gt.get).toArray
    val neg = (0 until 200).filterNot(gt.get).toArray
    val m = Classifier.train(f, pos, neg)
    val acc = (0 until 200).count(i => (m.score(f(i)) >= 0.5) == gt.get(i)) / 200.0
    assert(acc > 0.95, s"accuracy=$acc")
  }

  test("scores are probabilities in (0,1)") {
    val (f, gt) = clusters(100, 2)
    val m = Classifier.train(f, (0 until 100).filter(gt.get).toArray,
                             (0 until 100).filterNot(gt.get).toArray)
    for (i <- 0 until 100) {
      val s = m.score(f(i))
      assert(s > 0.0 && s < 1.0)
    }
  }

  test("empty positives yield the zero model") {
    val (f, _) = clusters(10, 3)
    val m = Classifier.train(f, Array.empty, Array(0, 1))
    assert(m.w.forall(_ == 0.0) && m.b === 0.0)
  }

  test("trainOnPositives samples negatives outside P") {
    val (f, gt) = clusters(300, 4)
    val pBits = new java.util.BitSet(300)
    (0 until 300).filter(gt.get).take(40).foreach(pBits.set)
    val m = Classifier.trainOnPositives(f, pBits, 300, 11)
    // positives should score higher on average than negatives
    val posAvg = (0 until 300).filter(gt.get).map(i => m.score(f(i))).sum / 150
    val negAvg = (0 until 300).filterNot(gt.get).map(i => m.score(f(i))).sum / 150
    assert(posAvg > negAvg + 0.2, s"pos=$posAvg neg=$negAvg")
  }

  test("trainOnPositives with empty P returns zero model") {
    val (f, _) = clusters(20, 5)
    val m = Classifier.trainOnPositives(f, new java.util.BitSet(20), 20, 1)
    assert(m.w.length === 4 || m.w.isEmpty)
    assert(m.b === 0.0)
  }

  test("scoreAll matches per-row scores") {
    val (f, gt) = clusters(50, 6)
    val m = Classifier.train(f, (0 until 50).filter(gt.get).toArray,
                             (0 until 50).filterNot(gt.get).toArray)
    val all = Classifier.scoreAll(f, m)
    for (i <- 0 until 50) assert(all(i) === m.score(f(i)))
  }

  test("bitsetIndices round-trips") {
    val bs = new java.util.BitSet(100)
    Seq(3, 17, 42, 99).foreach(bs.set)
    assert(Classifier.bitsetIndices(bs).toSeq === Seq(3, 17, 42, 99))
    assert(Classifier.bitsetIndices(new java.util.BitSet(5)).isEmpty)
  }

  test("training is deterministic given the seed") {
    val (f, gt) = clusters(120, 7)
    val pBits = new java.util.BitSet(120)
    (0 until 120).filter(gt.get).take(20).foreach(pBits.set)
    val m1 = Classifier.trainOnPositives(f, pBits, 120, 5)
    val m2 = Classifier.trainOnPositives(f, pBits, 120, 5)
    assert(m1.w.toSeq === m2.w.toSeq && m1.b === m2.b)
  }

  test("embedding-based classifier separates intents on real templates") {
    import repro.text.Pipeline
    def vec(s: String) = {
      val p = Pipeline.parse(s); Embeddings.sentenceVector(p.tokens, p.pos)
    }
    val pos = Array("craving some pizza right now", "just ordered sushi for dinner",
                    "had ramen for lunch today").map(vec)
    val neg = Array("booked my flight to paris", "watching the hockey game tonight",
                    "first day at my new job today").map(vec)
    val f = pos ++ neg
    val m = Classifier.train(f, Array(0, 1, 2), Array(3, 4, 5),
                             Classifier.Config(epochs = 300))
    val test = vec("anyone want to grab tacos tonight")
    val ctrl = vec("reading about mortgages all morning")
    assert(m.score(test) > m.score(ctrl))
  }
}
