package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.{Scenarios, Tables}

/** Tables 7–8: FFNN transfer-learning serving. */
class FfnnBench extends AnyFunSuite {

  test("FFNN storage: 15 GB of three models dedups to the shared-W1 5.4 GB band") {
    val b = Scenarios.ffnn
    val GB = 1L << 30
    val before = b.plainStore.totalBytes.toDouble / GB
    val after = b.store.totalBytes.toDouble / GB
    println(f"ffnn storage: $before%.1f GB -> $after%.1f GB")
    assert(before > 13 && before < 17, s"plain storage $before GB")
    assert(after > 4 && after < 7, s"dedup storage $after GB")
  }

  test("FFNN dedup is exact: no accuracy machinery involved, W1 fully shared") {
    val b = Scenarios.ffnn
    // Every W1 page is shared by all three models.
    val w1 = b.models.head.tensors.head.id
    val sharedW1 = b.store.sharedPages(w1)
    assert(sharedW1.nonEmpty)
    sharedW1.foreach(id => assert(b.store.refCount(id) == 3))
    // W2 pages are private.
    for (m <- b.models) {
      val w2 = m.tensors(1).id
      assert(b.store.privatePages(w2).nonEmpty)
      assert(b.store.sharedPages(w2).isEmpty)
    }
  }

  test("Table 7: dedup and optimized caching help on every storage configuration") {
    val t = Tables.table7()
    println(t.render)
    for (r <- t.rows) {
      assert(r(3).toDouble <= r(2).toDouble * 1.001, s"dedup slower: $r")
      assert(r(4).toDouble <= r(3).toDouble * 1.02, s"optimized slower: $r")
    }
    val hdd9 = t.rows.find(r => r(0) == "HDD" && r(1) == "9GB").get
    assert(hdd9(2).toDouble / hdd9(4).toDouble > 1.1,
      s"expected a material HDD 9GB speedup: $hdd9")
  }

  test("Table 8: netsDB outperforms TF loading from file; TF GPU fails at 3 models") {
    val t = Tables.table8()
    println(t.render)
    for (r <- t.rows) {
      assert(r(3) == "Failed" || r(1).toDouble < r(3).toDouble,
        s"netsDB should beat TF-file (CPU): $r")
    }
    val r3 = t.rows.find(_(0) == "3").get
    assert(r3(3) == "Failed", s"TF-file CPU should fail at 3 models: $r3")
    assert(r3(5) == "Failed" && r3(6) == "Failed" && r3(7) == "Failed",
      s"TF GPU should fail at 3 models: $r3")
    // TF from memory still wins when it fits.
    val r2 = t.rows.find(_(0) == "2").get
    assert(r2(2).toDouble < r2(1).toDouble, s"TF-mem should beat netsDB at 2 models: $r2")
  }
}
