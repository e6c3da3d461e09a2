package repro.eval

import repro.baselines.Emb
import scala.util.Random

/** The node-classification protocol of §5.4: L2-normalize the forward and
  * backward vectors separately and concatenate them as node features
  * (symmetric methods contribute their single vector), train a logistic
  * (softmax) classifier on a random fraction of the nodes and report
  * Micro-/Macro-F1 on the rest. The classifier is a hand-written
  * full-batch gradient-descent softmax regression — a substrate, since no
  * external ML library is assumed.
  */
object NodeClassification {

  /** Per-node features: [x̂_v ‖ ŷ_v] (or x̂_v alone for symmetric methods). */
  def features(emb: Emb): Array[Array[Double]] = {
    def norm(rows: Array[Array[Double]]): Array[Array[Double]] = rows.map { r =>
      val nn = math.sqrt(r.map(x => x * x).sum)
      if (nn > 0) r.map(_ / nn) else r
    }
    if (emb.symmetric) norm(emb.x)
    else norm(emb.x).zip(norm(emb.y)).map { case (a, b) => a ++ b }
  }

  final case class Split(trainIdx: Array[Int], testIdx: Array[Int])

  def split(n: Int, trainFrac: Double, seed: Long): Split = {
    val rng = new Random(seed)
    val order = rng.shuffle((0 until n).toVector)
    val nTrain = math.max(1, (n * trainFrac).toInt)
    Split(order.take(nTrain).toArray, order.drop(nTrain).toArray)
  }

  /** Softmax-regression weights: numClasses × (dim+1) (bias last). */
  def fit(feats: Array[Array[Double]], labels: Array[Int], idx: Array[Int],
          numClasses: Int, iters: Int = 300, lr: Double = 0.5,
          l2: Double = 1e-4): Array[Array[Double]] = {
    val dim = feats(0).length
    val w = Array.ofDim[Double](numClasses, dim + 1)
    val m = idx.length
    for (_ <- 1 to iters) {
      val grad = Array.ofDim[Double](numClasses, dim + 1)
      idx.foreach { i =>
        val p = predictProba(w, feats(i))
        var c = 0
        while (c < numClasses) {
          val err = p(c) - (if (labels(i) == c) 1.0 else 0.0)
          if (err != 0.0) {
            val gc = grad(c); val f = feats(i)
            var d = 0
            while (d < dim) { gc(d) += err * f(d); d += 1 }
            gc(dim) += err
          }
          c += 1
        }
      }
      var c = 0
      while (c < numClasses) {
        val wc = w(c); val gc = grad(c)
        var d = 0
        while (d <= dim) { wc(d) -= lr * (gc(d) / m + l2 * wc(d)); d += 1 }
        c += 1
      }
    }
    w
  }

  def predictProba(w: Array[Array[Double]], f: Array[Double]): Array[Double] = {
    val z = w.map { wc =>
      var s = wc(f.length)
      var d = 0
      while (d < f.length) { s += wc(d) * f(d); d += 1 }
      s
    }
    val mx = z.max
    val e = z.map(v => math.exp(v - mx))
    val tot = e.sum
    e.map(_ / tot)
  }

  def predict(w: Array[Array[Double]], f: Array[Double]): Int = {
    val p = predictProba(w, f)
    var best = 0
    var c = 1
    while (c < p.length) { if (p(c) > p(best)) best = c; c += 1 }
    best
  }

  /** Micro-F1 over single-label predictions (equals accuracy). */
  def microF1(pred: Array[Int], truth: Array[Int]): Double = {
    require(pred.length == truth.length && pred.nonEmpty)
    pred.zip(truth).count { case (a, b) => a == b }.toDouble / pred.length
  }

  /** Macro-F1: unweighted mean of per-class F1 over classes present in truth. */
  def macroF1(pred: Array[Int], truth: Array[Int], numClasses: Int): Double = {
    val f1s = (0 until numClasses).flatMap { c =>
      val tp = pred.indices.count(i => pred(i) == c && truth(i) == c).toDouble
      val fp = pred.indices.count(i => pred(i) == c && truth(i) != c).toDouble
      val fn = pred.indices.count(i => pred(i) != c && truth(i) == c).toDouble
      if (tp + fn == 0) None // class absent from truth
      else {
        val p = if (tp + fp > 0) tp / (tp + fp) else 0.0
        val r = tp / (tp + fn)
        Some(if (p + r > 0) 2 * p * r / (p + r) else 0.0)
      }
    }
    if (f1s.isEmpty) 0.0 else f1s.sum / f1s.size
  }

  /** End-to-end: features → split → fit → Micro-F1 (and Macro-F1). */
  def evaluate(emb: Emb, labels: Array[Int], numClasses: Int,
               trainFrac: Double, seed: Long = 3): (Double, Double) = {
    val feats = features(emb)
    val s = split(labels.length, trainFrac, seed)
    val w = fit(feats, labels, s.trainIdx, numClasses)
    val pred = s.testIdx.map(i => predict(w, feats(i)))
    val truth = s.testIdx.map(labels)
    (microF1(pred, truth), macroF1(pred, truth, numClasses))
  }
}
