package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.Emb
import scala.util.Random

/** Classifier-substrate tests (softmax regression, F1 metrics, features). */
class NodeClassificationSpec extends AnyFunSuite {

  test("features normalizes and concatenates forward/backward vectors") {
    val x = Array(Array(3.0, 4.0))
    val y = Array(Array(0.0, 2.0))
    val f = NodeClassification.features(Emb(x, y))
    assert(f(0).toSeq == Seq(0.6, 0.8, 0.0, 1.0))
  }

  test("features for symmetric embeddings uses the single vector") {
    val x = Array(Array(0.0, 5.0))
    val f = NodeClassification.features(Emb.symmetricOf(x))
    assert(f(0).toSeq == Seq(0.0, 1.0))
  }

  test("features leaves zero vectors untouched") {
    val f = NodeClassification.features(Emb.symmetricOf(Array(Array(0.0, 0.0))))
    assert(f(0).toSeq == Seq(0.0, 0.0))
  }

  test("split respects the training fraction and partitions the nodes") {
    val s = NodeClassification.split(100, 0.3, seed = 1)
    assert(s.trainIdx.length == 30)
    assert(s.testIdx.length == 70)
    assert((s.trainIdx ++ s.testIdx).sorted.toSeq == (0 until 100))
  }

  test("microF1 equals accuracy for single-label predictions") {
    val pred = Array(0, 1, 1, 2)
    val truth = Array(0, 1, 2, 2)
    assert(NodeClassification.microF1(pred, truth) == 0.75)
  }

  test("macroF1 hand-computed case") {
    val pred = Array(0, 0, 1, 1)
    val truth = Array(0, 1, 1, 1)
    // class 0: P=1/2, R=1 → F1=2/3 ; class 1: P=1, R=2/3 → F1=4/5
    val expected = (2.0 / 3 + 4.0 / 5) / 2
    assert(math.abs(NodeClassification.macroF1(pred, truth, 2) - expected) < 1e-12)
  }

  test("macroF1 ignores classes absent from the truth") {
    val pred = Array(0, 0)
    val truth = Array(0, 0)
    assert(NodeClassification.macroF1(pred, truth, 5) == 1.0)
  }

  test("softmax probabilities sum to 1 and favor the aligned class") {
    val w = Array(Array(1.0, 0.0, 0.0), Array(-1.0, 0.0, 0.0))
    val p = NodeClassification.predictProba(w, Array(2.0, 0.0))
    assert(math.abs(p.sum - 1.0) < 1e-12)
    assert(p(0) > p(1))
  }

  test("fit learns a linearly separable problem") {
    val rng = new Random(5)
    val n = 200
    val feats = Array.tabulate(n)(i =>
      Array(rng.nextGaussian() + (if (i % 2 == 0) 2.0 else -2.0), rng.nextGaussian()))
    val labels = Array.tabulate(n)(_ % 2)
    val idx = (0 until n).toArray
    val w = NodeClassification.fit(feats, labels, idx, numClasses = 2, iters = 200)
    val pred = feats.map(NodeClassification.predict(w, _))
    assert(NodeClassification.microF1(pred, labels) > 0.95)
  }

  test("evaluate returns metrics in [0,1] end to end") {
    val rng = new Random(6)
    val x = Array.tabulate(60)(i => Array(rng.nextGaussian() + i % 3, rng.nextGaussian()))
    val labels = Array.tabulate(60)(_ % 3)
    val (micro, macroScore) = NodeClassification.evaluate(Emb.symmetricOf(x), labels, 3, 0.5)
    assert(micro >= 0 && micro <= 1)
    assert(macroScore >= 0 && macroScore <= 1)
  }
}
