package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.{Scenarios, Tables}

/** Tables 4–6: text classification page sharing, refcounts, and latency. */
class TextClassBench extends AnyFunSuite {

  test("Table 4: accuracy gate holds every model's drop near the 3.5% threshold") {
    val t = Tables.table4()
    println(t.render)
    for (r <- t.rows) {
      val before = r(3).dropRight(1).toDouble
      val after = r(4).dropRight(1).toDouble
      assert(before - after <= 4.5, s"drop beyond gate+slack: $r")
    }
  }

  test("Table 4: trained models keep more private pages than frozen ones") {
    val t = Tables.table4()
    val priv = t.rows.map(r => r(0) -> r(1).toInt).toMap
    assert(priv("Model-4") > priv("Model-1"), "M4 (trainable, most diverged) vs M1 (frozen)")
    assert(priv("Model-2") > priv("Model-3"), "M2 (trainable) vs M3 (frozen)")
    assert(priv("Model-4") >= priv("Model-2"), "M4 diverged more than M2")
  }

  test("Table 4: every model's pages cover it (private + shared = all pages)") {
    val b = Scenarios.textClass
    for (m <- b.models) {
      val tid = m.primary.id
      val total = b.store.privatePages(tid).size + b.store.sharedPages(tid).size
      assert(total == b.store.pagesOf(tid).size)
      assert(total > 0)
    }
  }

  test("Table 5: refcount distribution is consistent with the store") {
    val t = Tables.table5()
    println(t.render)
    val b = Scenarios.textClass
    // The Total column must sum to the number of distinct stored pages.
    val totals = t.rows.map(_.last.toInt)
    assert(totals.sum == b.store.numPages,
      s"refcount totals ${totals.sum} != stored pages ${b.store.numPages}")
    // A healthy population of pages shared by all five models must exist.
    assert(t.rows.head.last.toInt > 10, s"too few fully-shared pages: ${t.rows.head}")
  }

  test("Table 5: per-model page counts add up to the model's page total") {
    val t = Tables.table5()
    val b = Scenarios.textClass
    for ((m, col) <- b.models.zipWithIndex) {
      val colSum = t.rows.map(r => r(col + 1).toInt).sum
      assert(colSum == b.store.pagesOf(m.primary.id).size,
        s"model ${m.id}: column sum $colSum != pages ${b.store.pagesOf(m.primary.id).size}")
    }
  }

  test("Table 6: dedup and optimized caching help in every configuration") {
    val t = Tables.table6()
    println(t.render)
    for (r <- t.rows) {
      assert(r(3).toDouble <= r(2).toDouble * 1.001, s"dedup slower: $r")
      assert(r(4).toDouble <= r(3).toDouble * 1.02, s"optimized slower: $r")
    }
    // Pool-size monotonicity per disk for the no-dedup column.
    for (disk <- Seq("SSD", "HDD")) {
      val vs = t.rows.filter(_(0) == disk).map(_(2).toDouble)
      assert(vs == vs.sorted, s"$disk w/o-dedup not monotone in shrinking pool: $vs")
    }
  }

  test("text classification storage: dedup reduces 320 pages to the paper's ~87-page band") {
    val b = Scenarios.textClass
    println(s"textclass pages: ${b.plainStore.numPages} -> ${b.store.numPages}")
    assert(b.plainStore.numPages == 320) // 5 models x 64 pages
    assert(b.store.numPages < 140, s"weak dedup: ${b.store.numPages} pages")
  }
}
