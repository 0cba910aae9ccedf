package repro.serving

import repro.{Oracle, SparkSpec}
import scala.util.Random

class BlockMatrixSpec extends SparkSpec {

  private def randMatrix(rows: Int, cols: Int, seed: Int): Array[Array[Double]] = {
    val rnd = new Random(seed)
    Array.fill(rows, cols)(math.rint(rnd.nextGaussian() * 100) / 100) // 2dp for stable oracle strings
  }

  private def assertClose(a: Array[Array[Double]], b: Array[Array[Double]]): Unit = {
    assert(a.length == b.length && a(0).length == b(0).length)
    for (i <- a.indices; j <- a(0).indices)
      assert(math.abs(a(i)(j) - b(i)(j)) < 1e-9, s"($i,$j): ${a(i)(j)} vs ${b(i)(j)}")
  }

  test("fromLocal/toLocal round-trips, including ragged edges") {
    val m = randMatrix(5, 7, 1)
    val bm = BlockMatrix.fromLocal(spark, m, 2, 3)
    assert(bm.rowBlks == 3 && bm.colBlks == 3)
    assertClose(bm.toLocal(), m)
  }

  test("multiply matches the local reference on divisible shapes") {
    val a = randMatrix(4, 6, 2); val b = randMatrix(6, 4, 3)
    val got = BlockMatrix.fromLocal(spark, a, 2, 3)
      .multiply(BlockMatrix.fromLocal(spark, b, 3, 2)).toLocal()
    assertClose(got, BlockMatrix.multiplyLocal(a, b))
  }

  test("multiply matches the local reference on ragged shapes (zero padding)") {
    val a = randMatrix(5, 7, 4); val b = randMatrix(7, 3, 5)
    val got = BlockMatrix.fromLocal(spark, a, 2, 3)
      .multiply(BlockMatrix.fromLocal(spark, b, 3, 2)).toLocal()
    assertClose(got, BlockMatrix.multiplyLocal(a, b))
  }

  test("multiply rejects mismatched dimensions") {
    val a = BlockMatrix.fromLocal(spark, randMatrix(4, 6, 6), 2, 3)
    val b = BlockMatrix.fromLocal(spark, randMatrix(5, 4, 7), 3, 2)
    intercept[IllegalArgumentException](a.multiply(b))
  }

  test("multiply agrees with DuckDB SQL over COO relations (oracle)") {
    val a = randMatrix(4, 5, 8); val b = randMatrix(5, 3, 9)
    val am = BlockMatrix.fromLocal(spark, a, 2, 2)
    val bm = BlockMatrix.fromLocal(spark, b, 2, 2)
    val result = am.multiply(bm).toCoo()
      .withColumnRenamed("v", "v0")
      .selectExpr("i", "j", "round(v0, 6) as v")
    Oracle.assertEquivalent(result,
      """SELECT a.i AS i, b.j AS j,
        |       round(SUM(CAST(a.v AS DOUBLE) * CAST(b.v AS DOUBLE)), 6) AS v
        |FROM a JOIN b ON a.j = b.i
        |GROUP BY a.i, b.j""".stripMargin,
      "a" -> am.toCoo(), "b" -> bm.toCoo())
  }

  test("add agrees with DuckDB SQL over COO relations (oracle)") {
    val a = randMatrix(4, 6, 10); val b = randMatrix(4, 6, 11)
    val am = BlockMatrix.fromLocal(spark, a, 2, 3)
    val bm = BlockMatrix.fromLocal(spark, b, 2, 3)
    val result = am.add(bm).toCoo()
      .withColumnRenamed("v", "v0")
      .selectExpr("i", "j", "round(v0, 6) as v")
    Oracle.assertEquivalent(result,
      """SELECT a.i AS i, a.j AS j,
        |       round(CAST(a.v AS DOUBLE) + CAST(b.v AS DOUBLE), 6) AS v
        |FROM a JOIN b ON a.i = b.i AND a.j = b.j""".stripMargin,
      "a" -> am.toCoo(), "b" -> bm.toCoo())
  }

  test("add matches elementwise local addition") {
    val a = randMatrix(3, 5, 12); val b = randMatrix(3, 5, 13)
    val got = BlockMatrix.fromLocal(spark, a, 2, 2).add(BlockMatrix.fromLocal(spark, b, 2, 2)).toLocal()
    val want = a.zip(b).map { case (ra, rb) => ra.zip(rb).map { case (x, y) => x + y } }
    assertClose(got, want)
  }

  test("transpose is a rekey plus block transpose") {
    val a = randMatrix(5, 3, 14)
    val got = BlockMatrix.fromLocal(spark, a, 2, 2).transpose.toLocal()
    val want = Array.tabulate(3, 5)((i, j) => a(j)(i))
    assertClose(got, want)
  }

  test("transpose twice is the identity") {
    val a = randMatrix(4, 6, 15)
    assertClose(BlockMatrix.fromLocal(spark, a, 3, 2).transpose.transpose.toLocal(), a)
  }

  test("addRowVector broadcasts a bias row") {
    val a = randMatrix(4, 6, 16); val bias = randMatrix(1, 6, 17)
    val got = BlockMatrix.fromLocal(spark, a, 2, 3)
      .addRowVector(BlockMatrix.fromLocal(spark, bias, 1, 3)).toLocal()
    val want = a.map(r => r.zip(bias(0)).map { case (x, b) => x + b })
    assertClose(got, want)
  }

  test("relu and sigmoid transforms") {
    val a = Array(Array(-1.0, 0.0, 2.0))
    val bm = BlockMatrix.fromLocal(spark, a, 1, 3)
    assertClose(bm.relu.toLocal(), Array(Array(0.0, 0.0, 2.0)))
    val sg = bm.sigmoid.toLocal()
    assert(math.abs(sg(0)(0) - 1.0 / (1 + math.exp(1.0))) < 1e-12)
    assert(math.abs(sg(0)(1) - 0.5) < 1e-12)
  }

  test("tanh transform") {
    val got = BlockMatrix.fromLocal(spark, Array(Array(0.5)), 1, 1).tanhAct.toLocal()
    assert(math.abs(got(0)(0) - math.tanh(0.5)) < 1e-12)
  }

  test("two-layer FFNN forward pass matches the local reference (Fig. 1)") {
    val x = randMatrix(3, 8, 18)
    val w1 = randMatrix(8, 4, 19); val b1 = randMatrix(1, 4, 20)
    val w2 = randMatrix(4, 2, 21); val b2 = randMatrix(1, 2, 22)
    val xm = BlockMatrix.fromLocal(spark, x, 2, 2)
    val h = xm.multiply(BlockMatrix.fromLocal(spark, w1, 2, 2))
      .addRowVector(BlockMatrix.fromLocal(spark, b1, 1, 2)).relu
    val y = h.multiply(BlockMatrix.fromLocal(spark, w2, 2, 2))
      .addRowVector(BlockMatrix.fromLocal(spark, b2, 1, 2))
    val hLocal = BlockMatrix.multiplyLocal(x, w1)
      .map(r => r.zip(b1(0)).map { case (v, b) => math.max(0.0, v + b) })
    val want = BlockMatrix.multiplyLocal(hLocal, w2)
      .map(r => r.zip(b2(0)).map { case (v, b) => v + b })
    assertClose(y.toLocal(), want)
  }

  test("word2vec embedding lookup as one-hot matmul (Sec. 7.1.1)") {
    // A bag-of-words one-hot row times the embedding matrix selects and sums rows.
    val emb = randMatrix(6, 4, 23)
    val x = Array.ofDim[Double](2, 6)
    x(0)(1) = 1.0; x(0)(3) = 1.0 // doc 0 = words 1 + 3
    x(1)(5) = 1.0                // doc 1 = word 5
    val got = BlockMatrix.fromLocal(spark, x, 1, 2)
      .multiply(BlockMatrix.fromLocal(spark, emb, 2, 2)).toLocal()
    val want = Array(
      emb(1).zip(emb(3)).map { case (a, b) => a + b },
      emb(5))
    assertClose(got, want)
  }

  test("toCoo covers exactly rows*cols logical entries") {
    val bm = BlockMatrix.fromLocal(spark, randMatrix(3, 5, 24), 2, 2)
    assert(bm.toCoo().count() == 15)
  }
}
