package repro.linalg

import repro.SparkSpec
import scala.util.Random

/** Unit tests for the distributed tall-skinny matrix substrate. */
class DistMatrixSpec extends SparkSpec {

  private def randLocal(n: Int, k: Int, seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    Array.fill(n, k)(rng.nextGaussian())
  }

  private def assertSame(a: Array[Array[Double]], b: Array[Array[Double]], tol: Double = 1e-9): Unit = {
    assert(a.length == b.length)
    for (i <- a.indices; j <- a(i).indices)
      assert(math.abs(a(i)(j) - b(i)(j)) <= tol, s"mismatch at ($i,$j): ${a(i)(j)} vs ${b(i)(j)}")
  }

  test("fromLocal / collectLocal roundtrip") {
    val local = randLocal(17, 5, 1)
    assertSame(DistMatrix.fromLocal(spark, local).collectLocal(), local)
  }

  test("zeros has all-zero rows for every id") {
    val z = DistMatrix.zeros(spark, 9, 3).collectLocal()
    assert(z.length == 9)
    assert(z.forall(_.forall(_ == 0.0)))
  }

  test("gaussian is deterministic in (seed, id)") {
    val a = DistMatrix.gaussian(spark, 11, 4, seed = 5).collectLocal()
    val b = DistMatrix.gaussian(spark, 11, 4, seed = 5).collectLocal()
    assertSame(a, b)
  }

  test("gaussian differs across seeds") {
    val a = DistMatrix.gaussian(spark, 8, 4, seed = 5).collectLocal()
    val b = DistMatrix.gaussian(spark, 8, 4, seed = 6).collectLocal()
    assert(a.zip(b).exists { case (ra, rb) => ra.toSeq != rb.toSeq })
  }

  test("scaled multiplies every entry") {
    val local = randLocal(6, 3, 2)
    val out = DistMatrix.fromLocal(spark, local).scaled(2.5).collectLocal()
    assertSame(out, local.map(_.map(_ * 2.5)))
  }

  test("scaleRows applies per-row factors") {
    val local = randLocal(5, 3, 3)
    val s = Array(1.0, 2.0, 0.0, -1.0, 0.5)
    val out = DistMatrix.fromLocal(spark, local).scaleRows(s).collectLocal()
    assertSame(out, local.zipWithIndex.map { case (r, i) => r.map(_ * s(i)) })
  }

  test("plus computes this + c·other") {
    val a = randLocal(7, 4, 4); val b = randLocal(7, 4, 5)
    val out = DistMatrix.fromLocal(spark, a).plus(DistMatrix.fromLocal(spark, b), -0.3).collectLocal()
    assertSame(out, a.zip(b).map { case (ra, rb) => ra.zip(rb).map { case (x, y) => x - 0.3 * y } })
  }

  test("plus rejects shape mismatch") {
    intercept[IllegalArgumentException] {
      DistMatrix.fromLocal(spark, randLocal(4, 3, 6))
        .plus(DistMatrix.fromLocal(spark, randLocal(4, 2, 7)))
    }
  }

  test("concat stacks columns") {
    val a = randLocal(5, 2, 8); val b = randLocal(5, 3, 9)
    val out = DistMatrix.fromLocal(spark, a).concat(DistMatrix.fromLocal(spark, b))
    assert(out.k == 5)
    assertSame(out.collectLocal(), a.zip(b).map { case (ra, rb) => ra ++ rb })
  }

  test("timesLocal matches local matmul") {
    val a = randLocal(9, 4, 10)
    val b = randLocal(4, 3, 11)
    val out = DistMatrix.fromLocal(spark, a).timesLocal(b).collectLocal()
    assertSame(out, Dense.matmul(a, b), 1e-9)
  }

  test("gram matches local gram") {
    val a = randLocal(30, 5, 12)
    val g = DistMatrix.fromLocal(spark, a).gram()
    assertSame(g, Dense.gram(a), 1e-8)
  }

  test("densify fills missing ids with zero rows") {
    import spark.implicits._
    val sparse = Seq((1L, Seq(1.0, 2.0)), (3L, Seq(3.0, 4.0))).toDF("id", "vec")
    val out = DistMatrix.densify(spark, sparse, 5, 2).collectLocal()
    assert(out(0).toSeq == Seq(0.0, 0.0))
    assert(out(1).toSeq == Seq(1.0, 2.0))
    assert(out(2).toSeq == Seq(0.0, 0.0))
    assert(out(3).toSeq == Seq(3.0, 4.0))
    assert(out(4).toSeq == Seq(0.0, 0.0))
  }

  test("checkpointed preserves contents") {
    val local = randLocal(12, 3, 13)
    val out = DistMatrix.fromLocal(spark, local).checkpointed().collectLocal()
    assertSame(out, local)
  }

  test("mapRows applies a row function with new width") {
    val local = randLocal(6, 4, 14)
    val out = DistMatrix.fromLocal(spark, local)
      .mapRows((_, v) => Array(v.sum), newK = 1)
    assert(out.k == 1)
    assertSame(out.collectLocal(), local.map(r => Array(r.sum)))
  }
}
