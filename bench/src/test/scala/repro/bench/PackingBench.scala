package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.Tables

/** Tables 11–13: page packing algorithms, offline and online. */
class PackingBench extends AnyFunSuite {

  test("Table 11: two-stage never loses; the baseline never wins") {
    val t = Tables.table11()
    println(t.render)
    // Columns: scenario, Baseline, Two-Stage, Greedy-1, Greedy-2.
    for (r <- t.rows) {
      val Seq(baseline, twoStage, greedy1, greedy2) = r.drop(1).map(_.toInt)
      assert(twoStage <= greedy1, s"two-stage > greedy1: $r")
      assert(twoStage <= baseline, s"two-stage > baseline: $r")
      assert(greedy2 <= baseline, s"greedy2 > baseline: $r")
    }
  }

  test("Table 11: smaller pages require more pages (300x300 at 32MB vs 64MB)") {
    val t = Tables.table11()
    val at64 = t.rows.find(_(0).contains("300x300, 64MB")).get(2).toInt
    val at32 = t.rows.find(_(0).contains("300x300, 32MB")).get(2).toInt
    assert(at32 > at64, s"32MB pages ($at32) should need more than 64MB pages ($at64)")
  }

  test("Table 12: every packer finishes fast; greedy2 pays for its subset search") {
    val t = Tables.table12()
    println(t.render)
    // Millisecond-scale timings are noisy; assert only robust facts: all
    // packers are fast, and on the coarse word2vec scenario (many tensors,
    // many bins) the full Alg. 3 costs more than class-based Alg. 2.
    for (r <- t.rows; c <- 1 to 4)
      assert(r(c).toDouble < 30.0, s"packer too slow: $r")
    val w2v = t.rows.find(_(0).startsWith("word2vec")).get
    val Seq(_, _, greedy1, greedy2) = w2v.drop(1).map(_.toDouble)
    assert(greedy2 >= greedy1, s"greedy2 ($greedy2 s) should not beat greedy1 ($greedy1 s) on word2vec")
  }

  test("Table 13: step 1 creates every page; later models mostly reuse pages") {
    val t = Tables.table13()
    println(t.render)
    val s1 = t.rows.head
    assert(s1(2).toInt == 0 && s1(3).toInt == 0, s"first step cannot reuse/discard: $s1")
    assert(s1(4).toInt > 0)
    for (r <- t.rows.drop(1)) {
      val reused = r(2).toInt; val discarded = r(3).toInt; val created = r(4).toInt
      assert(reused > discarded, s"step should reuse more than it discards: $r")
      assert(reused > created / 2, s"step should reuse a substantial fraction: $r")
    }
  }
}
