package repro.baselines

import repro.linalg.Dense

/** Uniform embedding container for evaluation: every method produces a
  * forward matrix `x` and backward matrix `y` (for symmetric/undirected
  * methods `y eq x`), and every task scores a pair (u,v) as `x(u)·y(v)` —
  * matching the per-method scoring rules of §5.2.
  */
final case class Emb(x: Array[Array[Double]], y: Array[Array[Double]]) {
  def symmetric: Boolean = x eq y
  def score(u: Int, v: Int): Double = Dense.dot(x(u), y(v))
  def dim: Int = if (x.isEmpty) 0 else x(0).length
}

object Emb {
  def symmetricOf(x: Array[Array[Double]]): Emb = Emb(x, x)
}
