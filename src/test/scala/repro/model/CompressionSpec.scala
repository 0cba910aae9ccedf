package repro.model

import org.scalatest.funsuite.AnyFunSuite
import repro.model.ModelGen._

class CompressionSpec extends AnyFunSuite {

  private val shape = EmbeddingShape(rowBlocks = 8, colBlocks = 2,
    rowsPerBlock = 4, colsPerBlock = 4, blockVirtualBytes = 1L << 20)
  private lazy val model = word2vecFamily(1, shape)._2.head

  test("prune zeroes (approximately) the requested fraction of weights") {
    val p = Compression.prune(model, 0.5)
    val all = p.tensors.flatMap(_.blocks).flatMap(_.data.toSeq)
    val zeroed = all.count(_ == 0.0).toDouble / all.size
    assert(math.abs(zeroed - 0.5) < 0.05, s"zeroed fraction $zeroed")
  }

  test("prune keeps the largest weights bit-exact") {
    val orig = model.tensors.head.blocks.flatMap(_.data.toSeq)
    val p = Compression.prune(model, 0.8)
    val kept = p.tensors.head.blocks.flatMap(_.data.toSeq).filter(_ != 0.0)
    val largestOrig = orig.map(math.abs).max
    assert(kept.map(math.abs).max == largestOrig)
  }

  test("prune(0) is the identity on values") {
    val p = Compression.prune(model, 0.0)
    p.tensors.head.blocks.zip(model.tensors.head.blocks).foreach { case (a, b) =>
      assert(a.sameContent(b))
    }
  }

  test("prune rejects fraction outside [0,1)") {
    intercept[IllegalArgumentException](Compression.prune(model, 1.0))
    intercept[IllegalArgumentException](Compression.prune(model, -0.1))
  }

  test("prunedSizeRatio matches the surviving-weight count") {
    val p = Compression.prune(model, 0.8)
    val all = p.tensors.flatMap(_.blocks).flatMap(_.data.toSeq)
    val nnzFrac = all.count(_ != 0.0).toDouble / all.size
    assert(math.abs(Compression.prunedSizeRatio(p) - nnzFrac * 10.0 / 8.0) < 1e-9)
  }

  test("quantize bounds the per-weight error by half a quantization step") {
    val q = Compression.quantize(model, 8)
    model.tensors.head.blocks.zip(q.tensors.head.blocks).foreach { case (o, d) =>
      val min = o.data.min; val max = o.data.max
      val step = (max - min) / 255
      o.data.zip(d.data).foreach { case (a, b) =>
        assert(math.abs(a - b) <= step / 2 + 1e-12)
      }
    }
  }

  test("quantize is idempotent") {
    val q1 = Compression.quantize(model, 6)
    val q2 = Compression.quantize(q1, 6)
    q1.tensors.head.blocks.zip(q2.tensors.head.blocks).foreach { case (a, b) =>
      b.data.zip(a.data).foreach { case (x, y) => assert(math.abs(x - y) < 1e-9) }
    }
  }

  test("quantize collapses sub-step drift to near-identical values (enables dedup)") {
    // Two copies of a block differing by noise far below the quantization
    // step collapse to the same codes (residual difference is only the
    // per-block offset) — why dedup after quantization finds more sharing
    // (Sec. 7.6).
    val a = model.tensors.head.blocks.head.data
    def oneBlockModel(data: Array[Double]) = model.copy(tensors = Vector(
      model.tensors.head.copy(rowBlocks = 1, colBlocks = 1,
        blocks = Vector(model.tensors.head.blocks.head.copy(data = data)))))
    val mSmall = oneBlockModel(a)
    val mDrift = oneBlockModel(a.map(_ + 1e-9))
    val qa = Compression.quantize(mSmall, 4).tensors.head.blocks.head.data
    val qb = Compression.quantize(mDrift, 4).tensors.head.blocks.head.data
    assert(qa.zip(qb).forall { case (x, y) => math.abs(x - y) <= 1e-8 })
  }

  test("quantizedSizeRatio is bits/64") {
    assert(Compression.quantizedSizeRatio(8) == 0.125)
    assert(Compression.quantizedSizeRatio(16) == 0.25)
  }

  test("quantize rejects invalid bit widths") {
    intercept[IllegalArgumentException](Compression.quantize(model, 0))
    intercept[IllegalArgumentException](Compression.quantize(model, 17))
  }
}
