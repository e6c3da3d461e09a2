package repro.core

import repro.graph.Graph
import scala.util.Random

/** Algorithm 3 — the complete NRP pipeline.
  *
  * 1. k′ = k/2; run [[ApproxPPR]] (distributed) for initial X, Y with
  *    `XYᵀ ≈ Π′`.
  * 2. Initialize w⃗_v = d_out(v), w⃖_v = 1.
  * 3. ℓ₂ coordinate-descent epochs, each one backward sweep
  *    ([[NodeWeights.updateBwdWeights]]) followed by one forward sweep
  *    ([[NodeWeights.updateFwdWeights]]).
  * 4. Final embeddings X_v ← w⃗_v·X_v, Y_v ← w⃖_v·Y_v, so that
  *    `X_u·Y_v ≈ w⃗_u·π(u,v)·w⃖_v` (Eq. 4).
  *
  * Overall O(k(m+kn)log n) time / O(m+nk) space, as analysed in §4.4.
  */
object NRP {

  /** Paper defaults (§5.1): ℓ₁=20, ℓ₂=10, α=0.15, ε=0.2, λ=10. */
  final case class Params(k: Int = 128, alpha: Double = 0.15, l1: Int = 20,
                          l2: Int = 10, eps: Double = 0.2, lambda: Double = 10.0,
                          seed: Long = 20)

  /** Final forward/backward embeddings plus the learned weights (exposed
    * for the reweighting-diagnostics tests).
    */
  final case class Result(x: Array[Array[Double]], y: Array[Array[Double]],
                          weights: NodeWeights.Weights)

  def apply(g: Graph, params: Params = Params()): Result = {
    val kPrime = math.max(1, params.k / 2)
    val emb = ApproxPPR(g, kPrime, params.alpha, params.l1, params.eps, params.seed)
    val x = emb.x.collectLocal()
    val y = emb.y.collectLocal()
    emb.x.unpersist(); emb.y.unpersist()
    reweight(g, x, y, params)
  }

  /** The reweighting stage alone, given ApproxPPR's output — lets the
    * parameter-sweep benches share one ApproxPPR run across ℓ₂ values.
    */
  def reweight(g: Graph, x0: Array[Array[Double]], y0: Array[Array[Double]],
               params: Params): Result = {
    val n = g.n.toInt
    val x = x0.map(_.clone())
    val y = y0.map(_.clone())
    val w = NodeWeights.init(g.outDeg)
    val rng = new Random(params.seed)
    for (_ <- 1 to params.l2) {
      NodeWeights.updateBwdWeights(x, y, g.outDeg, g.inDeg, w, params.lambda, rng)
      NodeWeights.updateFwdWeights(x, y, g.outDeg, g.inDeg, w, params.lambda, rng)
    }
    var v = 0
    while (v < n) {
      var r = 0
      while (r < x(v).length) { x(v)(r) *= w.wf(v); y(v)(r) *= w.wb(v); r += 1 }
      v += 1
    }
    Result(x, y, w)
  }

  /** Run the descent once but snapshot the rescaled embeddings at every
    * requested ℓ₂ — an ℓ₂-sweep (Fig. 8d / 11b) for the price of one run.
    * ℓ₂ = 0 means "reweighting disabled": per the paper's reading of
    * Fig. 8d it is the *plain ApproxPPR* embedding (unit weights), not the
    * descent initialization.
    */
  def reweightSweep(g: Graph, x0: Array[Array[Double]], y0: Array[Array[Double]],
                    params: Params, l2Values: Seq[Int]): Map[Int, Result] = {
    val n = g.n.toInt
    val w = NodeWeights.init(g.outDeg)
    val rng = new Random(params.seed)
    val want = l2Values.toSet
    val out = scala.collection.mutable.Map.empty[Int, Result]
    def snapshot(epoch: Int): Unit = if (want(epoch)) {
      if (epoch == 0) {
        val unit = Array.fill(n)(1.0)
        out(0) = Result(x0.map(_.clone()), y0.map(_.clone()), Weights(unit, unit.clone()))
      } else {
        val x = x0.zipWithIndex.map { case (row, v) => row.map(_ * w.wf(v)) }
        val y = y0.zipWithIndex.map { case (row, v) => row.map(_ * w.wb(v)) }
        out(epoch) = Result(x, y, Weights(w.wf.clone(), w.wb.clone()))
      }
    }
    snapshot(0)
    for (epoch <- 1 to l2Values.max) {
      NodeWeights.updateBwdWeights(x0, y0, g.outDeg, g.inDeg, w, params.lambda, rng)
      NodeWeights.updateFwdWeights(x0, y0, g.outDeg, g.inDeg, w, params.lambda, rng)
      snapshot(epoch)
    }
    out.toMap
  }

  private type Weights = NodeWeights.Weights
  private val Weights = NodeWeights.Weights
}
