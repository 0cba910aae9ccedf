package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.Tables

/** Table 14: deduplication composed with pruning and quantization. */
class CompressionBench extends AnyFunSuite {

  private def ratio(t: Tables.Table, col: Int): Double =
    t.rows(1)(col).dropRight(1).toDouble / 100.0
  private def drop(t: Tables.Table, col: Int): Double =
    t.rows(0)(col).dropRight(1).toDouble

  test("Table 14: dedup composes multiplicatively with pruning and quantization") {
    val t = Tables.table14()
    println(t.render)
    val pruning = ratio(t, 1); val quant = ratio(t, 2); val dedup = ratio(t, 3)
    val dp = ratio(t, 4); val dq = ratio(t, 5)
    assert(dp < pruning, s"dedup+pruning ($dp) should beat pruning alone ($pruning)")
    assert(dq < quant, s"dedup+quant ($dq) should beat quantization alone ($quant)")
    assert(dp < dedup && dq < dedup, "combinations should beat dedup alone")
    // The paper reports 2-3x gain from adding dedup on top of each technique.
    assert(pruning / dp > 1.5, s"dedup adds only ${pruning / dp}x on pruning")
    assert(quant / dq > 1.5, s"dedup adds only ${quant / dq}x on quantization")
  }

  test("Table 14: every technique keeps the worst-model accuracy drop moderate") {
    val t = Tables.table14()
    for (c <- 1 to 5)
      assert(drop(t, c) <= 6.0, s"column $c drop ${drop(t, c)}% too large")
  }

  test("Table 14: quantization ratio is exactly 8/64 bits") {
    val t = Tables.table14()
    assert(math.abs(ratio(t, 2) - 0.125) < 1e-9)
  }
}
