package repro.baselines

import repro.linalg.Dense

/** Driver-local matrix abstraction + randomized SVD, shared by the
  * baselines that factorize an explicitly-materialized proximity matrix
  * (STRAP's sparse transpose-proximity, NetMF's dense DeepWalk matrix,
  * DNGR-lite's PPMI). These methods materialize an n×n object by design —
  * exactly the scalability liability the paper attributes to them — so a
  * driver-local implementation is both faithful and sufficient: they are
  * only ever run on the small/medium graphs, as in the paper.
  */
object LocalMat {

  /** Minimal mat-mat interface: `b` is a dense n×k block. */
  trait Mat {
    def rows: Int
    def cols: Int
    /** `M · B` where B is cols×k. */
    def mult(b: Array[Array[Double]]): Array[Array[Double]]
    /** `Mᵀ · B` where B is rows×k. */
    def multT(b: Array[Array[Double]]): Array[Array[Double]]
  }

  /** Dense row-major matrix with parallel (fork-join) products. */
  final case class DenseMat(a: Array[Array[Double]]) extends Mat {
    def rows: Int = a.length
    def cols: Int = if (a.isEmpty) 0 else a(0).length
    def mult(b: Array[Array[Double]]): Array[Array[Double]] = {
      val k = b(0).length
      val out = Array.ofDim[Double](rows, k)
      java.util.stream.IntStream.range(0, rows).parallel().forEach { i =>
        val ai = a(i); val oi = out(i)
        var l = 0
        while (l < cols) {
          val c = ai(l)
          if (c != 0.0) {
            val bl = b(l)
            var j = 0
            while (j < k) { oi(j) += c * bl(j); j += 1 }
          }
          l += 1
        }
      }
      out
    }
    def multT(b: Array[Array[Double]]): Array[Array[Double]] = {
      val k = b(0).length
      val out = Array.ofDim[Double](cols, k)
      // column-parallel to avoid write races on out rows
      var i = 0
      while (i < rows) {
        val ai = a(i); val bi = b(i)
        var l = 0
        while (l < cols) {
          val c = ai(l)
          if (c != 0.0) {
            val ol = out(l)
            var j = 0
            while (j < k) { ol(j) += c * bi(j); j += 1 }
          }
          l += 1
        }
        i += 1
      }
      out
    }
  }

  /** CSR sparse matrix (values included). */
  final case class SparseMat(n: Int, nCols: Int, offsets: Array[Int],
                             colIdx: Array[Int], values: Array[Double]) extends Mat {
    def rows: Int = n
    def cols: Int = nCols
    def mult(b: Array[Array[Double]]): Array[Array[Double]] = {
      val k = b(0).length
      val out = Array.ofDim[Double](n, k)
      java.util.stream.IntStream.range(0, n).parallel().forEach { i =>
        val oi = out(i)
        var e = offsets(i)
        while (e < offsets(i + 1)) {
          val c = values(e); val bl = b(colIdx(e))
          var j = 0
          while (j < k) { oi(j) += c * bl(j); j += 1 }
          e += 1
        }
      }
      out
    }
    def multT(b: Array[Array[Double]]): Array[Array[Double]] = {
      val k = b(0).length
      val out = Array.ofDim[Double](nCols, k)
      var i = 0
      while (i < n) {
        val bi = b(i)
        var e = offsets(i)
        while (e < offsets(i + 1)) {
          val c = values(e); val ol = out(colIdx(e))
          var j = 0
          while (j < k) { ol(j) += c * bi(j); j += 1 }
          e += 1
        }
        i += 1
      }
      out
    }
  }

  /** Build a CSR matrix from (row, col, value) triples (duplicates summed). */
  def csrFromTriples(n: Int, nCols: Int, triples: Iterator[(Int, Int, Double)]): SparseMat = {
    val rowsBuf = Array.fill(n)(new scala.collection.mutable.LongMap[Double]())
    triples.foreach { case (r, c, v) =>
      val m = rowsBuf(r)
      m(c) = m.getOrElse(c, 0.0) + v
    }
    val offsets = new Array[Int](n + 1)
    var i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + rowsBuf(i).size; i += 1 }
    val colIdx = new Array[Int](offsets(n))
    val values = new Array[Double](offsets(n))
    i = 0
    while (i < n) {
      var p = offsets(i)
      rowsBuf(i).foreach { case (c, v) => colIdx(p) = c.toInt; values(p) = v; p += 1 }
      i += 1
    }
    SparseMat(n, nCols, offsets, colIdx, values)
  }

  /** Randomized subspace-iteration SVD: `M ≈ U diag(σ) Vᵀ` with k
    * components and `q` power iterations (Gram-whitening re-orth each
    * step) — the local analogue of [[repro.svd.BKSVD]].
    */
  def randomizedSVD(m: Mat, k: Int, q: Int = 5, seed: Long = 33):
      (Array[Array[Double]], Array[Double], Array[Array[Double]]) = {
    val rng = new scala.util.Random(seed)
    var block = Array.fill(m.cols, k)(rng.nextGaussian())
    var y = whitenLocal(m.mult(block))
    for (_ <- 1 to q) {
      y = whitenLocal(m.mult(m.multT(y)))
    }
    val z = m.multT(y) // n×r
    val small = Dense.gram(z)
    val eig = Dense.eigSym(small)
    val r = eig.values.length
    val take = math.min(k, r)
    val sigma = Array.tabulate(k)(j => if (j < take) math.sqrt(math.max(eig.values(j), 0.0)) else 0.0)
    val w = Array.tabulate(r, k)((i, j) => if (j < take) eig.vectors(i)(j) else 0.0)
    val u = Dense.matmul(y, w)
    val wS = Array.tabulate(r, k)((i, j) =>
      if (j < take && sigma(j) > 1e-12) eig.vectors(i)(j) / sigma(j) else 0.0)
    val v = Dense.matmul(z, wS)
    (u, sigma, v)
  }

  /** Orthonormalize the columns of a local tall-skinny block. */
  def whitenLocal(b: Array[Array[Double]]): Array[Array[Double]] =
    Dense.matmul(b, Dense.whitener(Dense.gram(b)))
}
