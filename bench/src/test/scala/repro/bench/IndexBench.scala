package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.Tables

/** Tables 9–10: duplicate-detection approaches compared on the text
  * classification workload.
  */
class IndexBench extends AnyFunSuite {

  test("Table 9: compression ordering — exact finds least, similarity-based find more") {
    val t = Tables.table9()
    println(t.render)
    val distinct = t.rows.map(r => r(0) -> r(2).toInt).toMap
    val total = t.rows.head(1).toInt
    assert(total == 2560) // 5 models x 512 blocks
    val exact = distinct("Mistique Exact Dedup")
    val proposed = distinct("Proposed (w/o finetune)")
    assert(exact > proposed, s"exact ($exact) should keep more blocks than proposed ($proposed)")
    assert(proposed < total / 2, s"proposed should at least halve the blocks: $proposed/$total")
    for ((name, d) <- distinct) assert(d <= total, s"$name: $d > $total")
  }

  test("Table 9: query-time ordering — LSH probes are far cheaper than MinHash and pairwise") {
    val t = Tables.table9()
    val q = t.rows.map(r => r(0) -> r(3).toDouble).toMap
    assert(q("Proposed (w/o finetune)") < q("Mistique Approximate Dedup"),
      s"LSH should beat MinHash: $q")
    assert(q("Proposed (w/o finetune)") < q("Enhanced Pairwise"),
      s"LSH should beat pairwise scan: $q")
  }

  test("Table 10: exact dedup never hurts accuracy; gated approaches respect the gate") {
    val t = Tables.table10()
    println(t.render)
    val exact = t.rows.find(_(0) == "Mistique Exact Dedup").get
    for (c <- 1 until exact.size)
      assert(exact(c).dropRight(1).toDouble == 0.0, s"exact dedup changed accuracy: $exact")
    for (r <- t.rows; c <- 1 until r.size) {
      assert(r(c).dropRight(1).toDouble <= 5.0, s"drop beyond gate+slack: $r")
    }
  }

  test("Table 10: the proposed approach is never worse than Mistique approximate on its worst model") {
    val t = Tables.table10()
    def worst(name: String): Double =
      t.rows.find(_(0) == name).get.drop(1).map(_.dropRight(1).toDouble).max
    assert(worst("Proposed (w/o finetune)") <= worst("Mistique Approximate Dedup") + 0.75,
      s"proposed ${worst("Proposed (w/o finetune)")} vs mistique ${worst("Mistique Approximate Dedup")}")
  }
}
