package repro.serving

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

/** One tensor block as a relation tuple (Sec. 2.1): grid position plus the
  * flattened row-major payload.
  */
final case class BlockRow(rowBlk: Int, colBlk: Int, data: Array[Double])

/** A dense matrix stored as a relation of fixed-shape blocks — the tensor
  * relational algebra (TRA) representation the paper builds on. Linear
  * algebra is expressed in DataFrame/Dataset operators so Catalyst plans it:
  * matrix multiply is a join followed by an aggregation (Fig. 1), transpose
  * is a rekey, activations are transforms.
  *
  * Logical size is `rows x cols`; blocks are `bRows x bCols` with zero
  * padding at the ragged edges (padding never changes products/sums).
  */
final case class BlockMatrix(ds: Dataset[BlockRow], rows: Int, cols: Int, bRows: Int, bCols: Int) {
  def rowBlks: Int = (rows + bRows - 1) / bRows
  def colBlks: Int = (cols + bCols - 1) / bCols

  import ds.sparkSession.implicits._

  /** Matrix multiply: join on inner block index + block-GEMM transform +
    * group-by aggregation summing partial products (Fig. 1).
    */
  def multiply(other: BlockMatrix): BlockMatrix = {
    require(cols == other.rows, s"dim mismatch: $cols vs ${other.rows}")
    require(bCols == other.bRows, s"block dim mismatch: $bCols vs ${other.bRows}")
    val m = bRows; val k = bCols; val n = other.bCols
    val joined = ds.toDF("a_r", "a_c", "a_d")
      .join(other.ds.toDF("b_r", "b_c", "b_d"), col("a_c") === col("b_r"))
    val partial = joined.select(col("a_r"), col("b_c"), col("a_d"), col("b_d"))
      .as[(Int, Int, Array[Double], Array[Double])]
      .map { case (r, c, a, b) =>
        val out = new Array[Double](m * n)
        var i = 0
        while (i < m) {
          var p = 0
          while (p < k) {
            val av = a(i * k + p)
            if (av != 0.0) {
              var j = 0
              while (j < n) { out(i * n + j) += av * b(p * n + j); j += 1 }
            }
            p += 1
          }
          i += 1
        }
        (r, c, out)
      }
    val reduced = partial
      .groupByKey { case (r, c, _) => (r, c) }
      .reduceGroups { (x, y) =>
        val s = x._3.clone()
        var i = 0
        while (i < s.length) { s(i) += y._3(i); i += 1 }
        (x._1, x._2, s)
      }
      .map { case ((r, c), (_, _, d)) => BlockRow(r, c, d) }
    BlockMatrix(reduced, rows, other.cols, bRows, other.bCols)
  }

  /** Matrix addition: an equijoin on the block key (Sec. 2.1). */
  def add(other: BlockMatrix): BlockMatrix = {
    require(rows == other.rows && cols == other.cols && bRows == other.bRows && bCols == other.bCols)
    val sum = ds.toDF("r", "c", "a")
      .join(other.ds.toDF("r", "c", "b"), Seq("r", "c"))
      .as[(Int, Int, Array[Double], Array[Double])]
      .map { case (r, c, a, b) =>
        BlockRow(r, c, a.zip(b).map { case (x, y) => x + y })
      }
    copy(ds = sum)
  }

  /** Broadcast a 1 x cols bias over every row: join on colBlk (the bias has
    * a single block row), then add its first row to every block row.
    */
  def addRowVector(bias: BlockMatrix): BlockMatrix = {
    require(bias.rows == 1 && bias.cols == cols && bias.bCols == bCols)
    val n = bCols; val m = bRows
    val out = ds.toDF("r", "c", "a")
      .join(bias.ds.toDF("br", "c", "b"), Seq("c"))
      .as[(Int, Int, Array[Double], Int, Array[Double])]
      .map { case (c, r, a, _, b) =>
        // join moved key first: columns are (c, r, a, br, b)
        val o = a.clone()
        var i = 0
        while (i < m) {
          var j = 0
          while (j < n) { o(i * n + j) += b(j); j += 1 }
          i += 1
        }
        BlockRow(r, c, o)
      }
    copy(ds = out)
  }

  /** Transpose: a rekey plus per-block transpose (Sec. 2.1). */
  def transpose: BlockMatrix = {
    val m = bRows; val n = bCols
    val t = ds.map { b =>
      val out = new Array[Double](n * m)
      var i = 0
      while (i < m) {
        var j = 0
        while (j < n) { out(j * m + i) = b.data(i * n + j); j += 1 }
        i += 1
      }
      BlockRow(b.colBlk, b.rowBlk, out)
    }
    BlockMatrix(t, cols, rows, bCols, bRows)
  }

  private def mapData(f: Double => Double): BlockMatrix =
    copy(ds = ds.map(b => BlockRow(b.rowBlk, b.colBlk, b.data.map(f))))

  /** Activation transforms (Sec. 2.1). */
  def relu: BlockMatrix = mapData(x => math.max(0.0, x))
  def sigmoid: BlockMatrix = mapData(x => 1.0 / (1.0 + math.exp(-x)))
  def tanhAct: BlockMatrix = mapData(math.tanh)

  /** Collect into a dense local matrix, dropping the zero padding. */
  def toLocal(): Array[Array[Double]] = {
    val out = Array.ofDim[Double](rows, cols)
    for (b <- ds.collect(); i <- 0 until bRows; j <- 0 until bCols) {
      val r = b.rowBlk * bRows + i; val c = b.colBlk * bCols + j
      if (r < rows && c < cols) out(r)(c) = b.data(i * bCols + j)
    }
    out
  }

  /** COO DataFrame (i, j, v) over the logical entries — for oracle checks. */
  def toCoo(): DataFrame = {
    val r = rows; val c0 = cols; val m = bRows; val n = bCols
    ds.flatMap { b =>
      for {
        i <- 0 until m
        j <- 0 until n
        gr = b.rowBlk * m + i
        gc = b.colBlk * n + j
        if gr < r && gc < c0
      } yield (gr, gc, b.data(i * n + j))
    }.toDF("i", "j", "v")
  }
}

object BlockMatrix {

  /** Block a small dense local matrix (tests, oracle fixtures). */
  def fromLocal(spark: SparkSession, m: Array[Array[Double]], bRows: Int, bCols: Int): BlockMatrix = {
    import spark.implicits._
    val rows = m.length; val cols = if (rows == 0) 0 else m(0).length
    val rb = (rows + bRows - 1) / bRows
    val cb = (cols + bCols - 1) / bCols
    val blocks = for (r <- 0 until rb; c <- 0 until cb) yield {
      val data = new Array[Double](bRows * bCols)
      for (i <- 0 until bRows; j <- 0 until bCols) {
        val gr = r * bRows + i; val gc = c * bCols + j
        if (gr < rows && gc < cols) data(i * bCols + j) = m(gr)(gc)
      }
      BlockRow(r, c, data)
    }
    BlockMatrix(spark.createDataset(blocks), rows, cols, bRows, bCols)
  }

  /** Local dense reference multiply for cross-checks. */
  def multiplyLocal(a: Array[Array[Double]], b: Array[Array[Double]]): Array[Array[Double]] = {
    val m = a.length; val k = a(0).length; val n = b(0).length
    val out = Array.ofDim[Double](m, n)
    for (i <- 0 until m; p <- 0 until k; j <- 0 until n) out(i)(j) += a(i)(p) * b(p)(j)
    out
  }
}
