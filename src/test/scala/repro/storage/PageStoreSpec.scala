package repro.storage

import org.scalatest.funsuite.AnyFunSuite
import repro.core.PagePacking.{Packing, Problem, twoStage}

class PageStoreSpec extends AnyFunSuite {

  /** Two tensors sharing items 0..3; items 4/5 private to t1, 6/7 to t2. */
  private def problem: Problem = Problem(
    owners = (0 to 3).map(_ -> Set(1, 2)).toMap ++ Map(4 -> Set(1), 5 -> Set(1), 6 -> Set(2), 7 -> Set(2)),
    tensors = Map(1 -> Vector(0, 1, 2, 3, 4, 5), 2 -> Vector(0, 1, 2, 3, 6, 7)), l = 2)

  private def loadedStore: (PageStore, Packing) = {
    val p = problem
    val pk = twoStage(p)
    val store = new PageStore(pageBytes = 64L << 20)
    store.load(pk, p)
    (store, pk)
  }

  test("load assigns shared pages to the shared sets of all owners") {
    val (store, _) = loadedStore
    assert(store.sharedPages(1).nonEmpty)
    assert(store.sharedPages(1).toSet == store.sharedPages(2).toSet)
    store.sharedPages(1).foreach(id => assert(store.refCount(id) == 2))
  }

  test("load assigns private pages with refcount 1") {
    val (store, _) = loadedStore
    for (t <- Seq(1, 2); id <- store.privatePages(t)) {
      assert(store.refCount(id) == 1)
      assert(store.owners(id) == Set(t))
    }
    assert(store.privatePages(1).nonEmpty && store.privatePages(2).nonEmpty)
  }

  test("pagesOf covers exactly the tensor's items") {
    val (store, _) = loadedStore
    val items1 = store.pagesOf(1).flatMap(id => store.page(id).items).toSet
    assert(items1 == problem.tensors(1).toSet)
  }

  test("numPages and totalBytes reflect distinct stored pages") {
    val (store, pk) = loadedStore
    assert(store.numPages == pk.numDistinctPages)
    assert(store.totalBytes == pk.numDistinctPages.toLong * (64L << 20))
  }

  test("removeTensor deletes private pages and decrements shared refcounts") {
    val (store, _) = loadedStore
    val sharedBefore = store.sharedPages(1)
    val privateBefore = store.privatePages(1)
    store.removeTensor(1)
    privateBefore.foreach(id => assert(store.refCount(id) == 0))
    assert(store.tensors == Set(2))
    // Shared pages demoted to t2's private set (refcount dropped to 1).
    sharedBefore.foreach { id =>
      assert(store.refCount(id) == 1)
      assert(store.privatePages(2).contains(id))
      assert(!store.sharedPages(2).contains(id))
    }
  }

  test("removing both tensors empties the store") {
    val (store, _) = loadedStore
    store.removeTensor(1); store.removeTensor(2)
    assert(store.numPages == 0)
    assert(store.tensors.isEmpty)
  }

  test("insertTensor creates private pages and promotes referenced private pages to shared") {
    val (store, _) = loadedStore
    store.removeTensor(1) // t2 now owns everything; former shared pages are private
    val demoted = store.privatePages(2).filter(id => store.page(id).items.subsetOf(Set(0, 1, 2, 3)))
    assert(demoted.nonEmpty)
    val created = store.insertTensor(3, privateItems = Seq(Set(8, 9)), sharedWith = demoted)
    assert(created.size == 1)
    assert(store.privatePages(3) == created)
    demoted.foreach { id =>
      assert(store.refCount(id) == 2)
      assert(store.sharedPages(3).contains(id))
      assert(store.sharedPages(2).contains(id))
      assert(!store.privatePages(2).contains(id))
    }
  }

  test("insertTensor rejects references to unknown pages") {
    val (store, _) = loadedStore
    intercept[IllegalArgumentException] {
      store.insertTensor(9, Seq.empty, Seq(PageId(999)))
    }
  }

  test("update = remove + insert keeps other tensors untouched") {
    val (store, _) = loadedStore
    val t2PagesBefore = store.pagesOf(2).toSet
    val shared = store.sharedPages(2)
    store.removeTensor(1)
    store.insertTensor(1, privateItems = Seq(Set(4, 5)), sharedWith = shared)
    val items2 = store.pagesOf(2).flatMap(id => store.page(id).items).toSet
    assert(items2 == problem.tensors(2).toSet)
    assert(store.pagesOf(2).toSet == t2PagesBefore)
  }
}
