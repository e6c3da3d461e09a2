package repro.core

import repro.graph.Graph
import repro.linalg.DistMatrix
import repro.svd.BKSVD

/** Algorithm 1 — ApproxPPR: implicit factorization of the truncated PPR
  * matrix `Π′ = Σ_{i=1…ℓ₁} α(1−α)^i P^i` into forward/backward embeddings
  * `X Yᵀ ≈ Π′`, without materializing Π.
  *
  * `BKSVD(A) = UΣVᵀ` seeds `X₁ = D⁻¹U√Σ`, `Y = V√Σ` (so `X₁Yᵀ ≈ P`);
  * then `Xᵢ = (1−α)·P·Xᵢ₋₁ + X₁` for ℓ₁−1 steps and a final scaling by
  * `α(1−α)` gives `X = Σ_{i=1…ℓ₁} α(1−α)^i P^{i−1} X₁`. Theorem 1 bounds
  * `|Π[u,v] − (XYᵀ)[u,v]|` for u≠v by
  * `(1+ε)σ_{k′+1}(1−α)(1−(1−α)^{ℓ₁}) + (1−α)^{ℓ₁+1}`.
  */
object ApproxPPR {

  /** Forward (`x`) and backward (`y`) embedding matrices, n×k′ each. */
  final case class Embeddings(x: DistMatrix, y: DistMatrix) {
    def local: LocalEmb = LocalEmb(x.collectLocal(), y.collectLocal())
  }

  /** Driver-local copy of the embeddings used by reweighting + evaluation. */
  final case class LocalEmb(x: Array[Array[Double]], y: Array[Array[Double]])

  def apply(g: Graph, kPrime: Int, alpha: Double = 0.15, l1: Int = 20,
            eps: Double = 0.2, seed: Long = 20): Embeddings = {
    val svd = BKSVD(g, kPrime, eps, seed)
    val sqrtSigma = diag(svd.sigma.map(math.sqrt))
    val x1 = svd.u.timesLocal(sqrtSigma).scaleRows(g.invOutDeg).checkpointed().cache()
    val y = svd.v.timesLocal(sqrtSigma).checkpointed()
    var x = x1
    for (_ <- 2 to l1) {
      // Xᵢ = (1−α)·P·Xᵢ₋₁ + X₁ — checkpoint each step to bound lineage.
      x = x1.plus(g.pMultiply(x), 1 - alpha).checkpointed()
    }
    x = x.scaled(alpha * (1 - alpha)).checkpointed()
    x1.unpersist()
    Embeddings(x, y)
  }

  /** Run one BKSVD + iteration chain but snapshot the embeddings at every
    * requested ℓ₁ — an ℓ₁-sweep (Fig. 8c / 11a) for the price of one run.
    */
  def sweep(g: Graph, kPrime: Int, alpha: Double, l1Values: Seq[Int],
            eps: Double = 0.2, seed: Long = 20): Map[Int, LocalEmb] = {
    val svd = BKSVD(g, kPrime, eps, seed)
    val sqrtSigma = diag(svd.sigma.map(math.sqrt))
    val x1 = svd.u.timesLocal(sqrtSigma).scaleRows(g.invOutDeg).checkpointed().cache()
    val y = svd.v.timesLocal(sqrtSigma).checkpointed()
    val yLocal = y.collectLocal()
    val want = l1Values.toSet
    val out = scala.collection.mutable.Map.empty[Int, LocalEmb]
    var x = x1
    for (i <- 1 to l1Values.max) {
      if (i > 1) x = x1.plus(g.pMultiply(x), 1 - alpha).checkpointed()
      if (want(i))
        out(i) = LocalEmb(x.scaled(alpha * (1 - alpha)).collectLocal(), yLocal)
    }
    x1.unpersist()
    out.toMap
  }

  private def diag(d: Array[Double]): Array[Array[Double]] =
    Array.tabulate(d.length, d.length)((i, j) => if (i == j) d(i) else 0.0)
}
