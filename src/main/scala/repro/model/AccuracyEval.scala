package repro.model

import repro.core.{BlockId, BlockRef}
import repro.model.ModelGen.{EmbeddingFamily, EmbeddingShape}
import scala.util.Random

/** Forward-pass validation accuracy for embedding-classifier models.
  *
  * Substitutes the paper's IMDB/Yelp/civil-comments AUC measurements
  * (DESIGN.md §2): a validation example is a small "bag of words" whose rows
  * are drawn preferentially from *hot* (high-magnitude) block-rows; its
  * ground-truth label is the sign of the model's ORIGINAL logit plus label
  * noise. A model's accuracy is real agreement of its current (possibly
  * deduplicated) forward pass with those labels — so replacing a hot block
  * by a similar-but-different representative genuinely moves logits on most
  * examples, while cold-block replacements barely matter. This is the
  * mechanism behind the paper's magnitude-aware ordering.
  */
final class AccuracyEval(family: EmbeddingFamily, numExamples: Int = 1500,
                         wordsPerExample: Int = 8, seed: Long = 1234L) {

  private val shape: EmbeddingShape = family.shape

  /** Validation rows: each example is a set of vocabulary row indices. */
  val examples: Array[Array[Int]] = {
    val rnd = new Random(seed)
    // Sample block-rows proportionally to hotness, then a uniform row inside.
    val cum = family.hot.scanLeft(0.0)(_ + _).tail
    val total = cum.last
    Array.fill(numExamples) {
      Array.fill(wordsPerExample) {
        val u = rnd.nextDouble() * total
        var lo = 0; var hi = cum.length - 1
        while (lo < hi) { val mid = (lo + hi) / 2; if (cum(mid) < u) lo = mid + 1 else hi = mid }
        lo * shape.rowsPerBlock + rnd.nextInt(shape.rowsPerBlock)
      }
    }
  }

  /** Logit of one example under a block-data lookup for tensor `tensorId`. */
  def logit(example: Array[Int], tensorId: Int,
            lookup: BlockRef => Array[Double], head: Array[Double], bias: Double): Double = {
    var out = bias
    var w = 0
    while (w < example.length) {
      val row = example(w)
      val br = row / shape.rowsPerBlock
      val rIn = row % shape.rowsPerBlock
      var bc = 0
      while (bc < shape.colBlocks) {
        val data = lookup(BlockRef(tensorId, BlockId(br, bc)))
        var cIn = 0
        while (cIn < shape.colsPerBlock) {
          out += data(rIn * shape.colsPerBlock + cIn) * head(bc * shape.colsPerBlock + cIn)
          cIn += 1
        }
        bc += 1
      }
      w += 1
    }
    out
  }

  /** Ground-truth labels for a model: original logits + per-model label noise.
    * Deterministic in (model id, labelNoise, seed).
    */
  def labels(model: Model, labelNoise: Double): Array[Boolean] = {
    val rnd = new Random(seed * 31L + model.id)
    val orig: BlockRef => Array[Double] = {
      val m = ModelGen.blockData(Seq(model)); r => m(r)
    }
    examples.map { ex =>
      val l = logit(ex, model.primary.id, orig, model.head, model.bias)
      l + rnd.nextGaussian() * labelNoise * logitScale(model) > 0
    }
  }

  /** Typical |logit| magnitude, used to express label noise relatively. */
  def logitScale(model: Model): Double = {
    val orig: BlockRef => Array[Double] = {
      val m = ModelGen.blockData(Seq(model)); r => m(r)
    }
    val ls = examples.take(200).map(ex =>
      math.abs(logit(ex, model.primary.id, orig, model.head, model.bias)))
    ls.sum / ls.length
  }

  /** Accuracy of a (possibly deduplicated) model against fixed labels. */
  def accuracy(model: Model, lbls: Array[Boolean], lookup: BlockRef => Array[Double]): Double = {
    var hits = 0
    var i = 0
    while (i < examples.length) {
      val l = logit(examples(i), model.primary.id, lookup, model.head, model.bias)
      if ((l > 0) == lbls(i)) hits += 1
      i += 1
    }
    hits.toDouble / examples.length
  }
}
