package repro.model

import org.scalatest.funsuite.AnyFunSuite
import repro.model.ModelGen._

class ModelGenSpec extends AnyFunSuite {

  private val smallShape = EmbeddingShape(rowBlocks = 16, colBlocks = 2,
    rowsPerBlock = 4, colsPerBlock = 4, blockVirtualBytes = 1L << 20)

  test("EmbeddingShape derived dimensions") {
    assert(smallShape.vocab == 64)
    assert(smallShape.embDim == 8)
    assert(smallShape.blockDim == 16)
    assert(smallShape.numBlocks == 32)
  }

  test("word2vec family is deterministic in its seed") {
    val (_, a) = word2vecFamily(3, smallShape, seed = 5)
    val (_, b) = word2vecFamily(3, smallShape, seed = 5)
    for ((ma, mb) <- a.zip(b); (ba, bb) <- ma.primary.blocks.zip(mb.primary.blocks))
      assert(ba.sameContent(bb))
  }

  test("different seeds give different families") {
    val (_, a) = word2vecFamily(1, smallShape, seed = 5)
    val (_, b) = word2vecFamily(1, smallShape, seed = 6)
    assert(!a.head.primary.blocks.head.sameContent(b.head.primary.blocks.head))
  }

  test("word2vec models share most blocks approximately with the base") {
    val (fam, models) = word2vecFamily(2, smallShape)
    val base = fam.baseTensor(999, "base")
    for (m <- models) {
      val dists = m.primary.blocks.zip(base.blocks).map { case (a, b) => a.l2(b) }
      val near = dists.count(_ < 0.1)
      // trainDrift 0.004 over 16 dims => distance ~0.016 for drifted blocks;
      // strong divergence (scale 1.0) is far larger.
      assert(near >= (smallShape.numBlocks * 0.85).toInt,
        s"model ${m.name}: only $near/${smallShape.numBlocks} blocks near base")
      assert(dists.exists(_ > 0.5), s"model ${m.name} has no strongly diverged blocks")
    }
  }

  test("word2vec family produces the requested number of models with distinct ids") {
    val (_, models) = word2vecFamily(6, smallShape)
    assert(models.size == 6)
    assert(models.map(_.id).distinct.size == 6)
  }

  test("text classification: frozen models are bit-identical to the pretrained base") {
    val (fam, models) = textClassFamily(smallShape)
    val base = fam.baseTensor(42, "base")
    for (i <- Seq(0, 2)) { // tc1, tc3 frozen
      models(i).primary.blocks.zip(base.blocks).foreach { case (a, b) =>
        assert(a.sameContent(b), s"model ${models(i).name} block ${a.ref} differs from base")
      }
    }
  }

  test("text classification: trained models drift on every block") {
    val (fam, models) = textClassFamily(smallShape)
    val base = fam.baseTensor(42, "base")
    for (i <- Seq(1, 3, 4)) {
      val same = models(i).primary.blocks.zip(base.blocks).count { case (a, b) => a.sameContent(b) }
      assert(same == 0, s"model ${models(i).name} still has $same bit-identical blocks")
    }
  }

  test("text classification: strong-divergence ordering matches Table 4 (M4 > M2 > M5)") {
    val (fam, models) = textClassFamily(smallShape)
    val base = fam.baseTensor(42, "base")
    def farCount(m: Model) =
      m.primary.blocks.zip(base.blocks).count { case (a, b) => a.l2(b) > 0.5 }
    assert(farCount(models(3)) > farCount(models(1)))
    assert(farCount(models(1)) > farCount(models(4)))
  }

  test("ffnn family: W1 identical across models, W2 private") {
    val models = ffnnFamily(3, w1Blocks = 10, w2Blocks = 4, blockDim = 8)
    val w1s = models.map(_.tensors(0))
    for (m <- 1 until 3; i <- 0 until 10)
      assert(w1s(0).blocks(i).sameContent(w1s(m).blocks(i)))
    val w2a = models(0).tensors(1); val w2b = models(1).tensors(1)
    assert(!w2a.blocks.head.sameContent(w2b.blocks.head))
  }

  test("ffnn family: tensor ids are globally unique") {
    val models = ffnnFamily(3, w1Blocks = 2, w2Blocks = 2, blockDim = 4)
    val ids = models.flatMap(_.tensors).map(_.id)
    assert(ids.distinct.size == ids.size)
  }

  test("allBlocks and blockData cover every logical block") {
    val models = ffnnFamily(2, w1Blocks = 3, w2Blocks = 2, blockDim = 4)
    val blocks = allBlocks(models)
    assert(blocks.size == 2 * (3 + 2))
    val data = blockData(models)
    assert(data.size == blocks.size)
    assert(blocks.forall(b => data(b.ref) eq b.data))
  }

  test("virtualBytes reflect paper-scale sizes") {
    val (_, models) = word2vecFamily(1, EmbeddingShape())
    // 512 blocks x 8 MB = 4 GB, the paper's word2vec model size.
    assert(models.head.virtualBytes == 512L * (8L << 20))
  }
}
