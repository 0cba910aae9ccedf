package repro.serving

import repro.SparkSpec
import scala.util.Random

/** Algebraic laws of the TRA operators — chained plans through Catalyst. */
class BlockMatrixAlgebraSpec extends SparkSpec {

  private def rand(rows: Int, cols: Int, seed: Int): Array[Array[Double]] = {
    val rnd = new Random(seed)
    Array.fill(rows, cols)(rnd.nextGaussian())
  }

  private def assertClose(a: Array[Array[Double]], b: Array[Array[Double]]): Unit = {
    assert(a.length == b.length && a(0).length == b(0).length)
    for (i <- a.indices; j <- a(0).indices)
      assert(math.abs(a(i)(j) - b(i)(j)) < 1e-9, s"($i,$j)")
  }

  private def bm(m: Array[Array[Double]], br: Int = 2, bc: Int = 2) =
    BlockMatrix.fromLocal(spark, m, br, bc)

  test("(A x B)^T equals B^T x A^T") {
    val a = rand(4, 5, 1); val b = rand(5, 3, 2)
    val left = bm(a).multiply(bm(b)).transpose.toLocal()
    val right = bm(b).transpose.multiply(bm(a).transpose).toLocal()
    assertClose(left, right)
  }

  test("A x (B + C) equals A x B + A x C") {
    val a = rand(3, 4, 3); val b = rand(4, 4, 4); val c = rand(4, 4, 5)
    val left = bm(a).multiply(bm(b).add(bm(c))).toLocal()
    val right = bm(a).multiply(bm(b)).add(bm(a).multiply(bm(c))).toLocal()
    assertClose(left, right)
  }

  test("(A x B) x C equals A x (B x C)") {
    val a = rand(3, 4, 6); val b = rand(4, 5, 7); val c = rand(5, 2, 8)
    val left = bm(a).multiply(bm(b)).multiply(bm(c)).toLocal()
    val right = bm(a).multiply(bm(b).multiply(bm(c))).toLocal()
    assertClose(left, right)
  }

  test("multiplying by the identity is the identity") {
    val a = rand(4, 4, 9)
    val id = Array.tabulate(4, 4)((i, j) => if (i == j) 1.0 else 0.0)
    assertClose(bm(a).multiply(bm(id)).toLocal(), a)
    assertClose(bm(id).multiply(bm(a)).toLocal(), a)
  }

  test("multiplying by zero yields zero") {
    val a = rand(3, 4, 10)
    val z = Array.fill(4, 2)(0.0)
    val out = bm(a).multiply(bm(z)).toLocal()
    assert(out.flatten.forall(_ == 0.0))
  }

  test("relu is idempotent; sigmoid stays in (0,1)") {
    val a = rand(3, 5, 11)
    val once = bm(a).relu.toLocal()
    val twice = bm(a).relu.relu.toLocal()
    assertClose(once, twice)
    assert(bm(a).sigmoid.toLocal().flatten.forall(v => v > 0 && v < 1))
  }

  test("addition is commutative") {
    val a = rand(4, 4, 12); val b = rand(4, 4, 13)
    assertClose(bm(a).add(bm(b)).toLocal(), bm(b).add(bm(a)).toLocal())
  }

  test("different blockings of the same matrices multiply to the same result") {
    val a = rand(6, 6, 14); val b = rand(6, 6, 15)
    val r1 = bm(a, 2, 3).multiply(bm(b, 3, 2)).toLocal()
    val r2 = bm(a, 3, 2).multiply(bm(b, 2, 3)).toLocal()
    assertClose(r1, r2)
  }
}
