package repro.engine

import org.scalatest.funsuite.AnyFunSuite

class CachesSpec extends AnyFunSuite {
  private def nb(x: Int) = Array(x)

  test("LRBU evicts the least-recent-batch (smallest order) vertex") {
    val c = new LrbuCache(2, copyOnGet = false, locked = false)
    c.insert(1, nb(1)); c.insert(2, nb(2))
    c.insert(3, nb(3)) // full: evict 1 (smallest order)
    assert(!c.contains(1) && c.contains(2) && c.contains(3))
    assert(c.size == 2)
  }

  test("LRBU seal protects an entry from eviction") {
    val c = new LrbuCache(2, copyOnGet = false, locked = false)
    c.insert(1, nb(1)); c.insert(2, nb(2))
    c.seal(1)
    c.insert(3, nb(3)) // must evict 2, not the sealed 1
    assert(c.contains(1) && !c.contains(2) && c.contains(3))
  }

  test("LRBU release gives released vertices the largest order") {
    val c = new LrbuCache(2, copyOnGet = false, locked = false)
    c.insert(1, nb(1)); c.insert(2, nb(2))
    c.seal(1); c.release() // order is now [2, 1]
    c.insert(3, nb(3))     // evicts 2
    assert(c.contains(1) && !c.contains(2) && c.contains(3))
  }

  test("LRBU overflows (bounded) when everything is sealed") {
    val c = new LrbuCache(1, copyOnGet = false, locked = false)
    c.insert(1, nb(1)); c.seal(1)
    c.insert(2, nb(2)) // free set empty: insert regardless of capacity
    assert(c.contains(1) && c.contains(2) && c.size == 2)
    c.release()
    c.insert(3, nb(3)) // now eviction resumes
    assert(c.size == 2)
  }

  test("LRBU get is zero-copy; LRBU-Copy clones") {
    val arr = nb(42)
    val c = new LrbuCache(4, copyOnGet = false, locked = false)
    c.insert(7, arr)
    assert(c.get(7) eq arr)
    val cc = new LrbuCache(4, copyOnGet = true, locked = false)
    cc.insert(7, arr)
    val got = cc.get(7)
    assert((got ne arr) && got.sameElements(arr))
  }

  test("LRBU get returns null for missing entries") {
    val c = new LrbuCache(4, copyOnGet = false, locked = false)
    assert(c.get(99) == null && !c.contains(99))
  }

  test("LRU-Inf never evicts and updates recency on read") {
    val c = new LruCache(Int.MaxValue)
    for (i <- 1 to 1000) c.insert(i, nb(i))
    assert(c.size == 1000)
    assert((1 to 1000).forall(c.contains))
  }

  test("Cncr-LRU is bounded and disables the two-stage protocol") {
    val c = new ConcurrentLruCache(3)
    assert(!c.twoStage)
    for (i <- 1 to 10) c.insert(i, nb(i))
    assert(c.size == 3)
    assert(c.contains(10) && !c.contains(1))
    // get refreshes recency: touch 8, insert new, 9 should go before 8.
    c.get(8)
    c.insert(11, nb(11))
    assert(c.contains(8) && !c.contains(9))
  }

  test("cache factory builds every Table 5 variant") {
    for (kind <- Seq("lrbu", "lrbu-copy", "lrbu-lock", "lru-inf", "cncr-lru")) {
      val c = NbrCache(kind, 8)
      c.insert(1, nb(1))
      assert(c.get(1) != null, kind)
    }
    intercept[RuntimeException] { NbrCache("bogus", 8) }
  }

  test("concurrent reads on LRBU during a sealed batch are consistent") {
    val c = new LrbuCache(64, copyOnGet = false, locked = false)
    for (i <- 0 until 64) { c.insert(i, nb(i)); c.seal(i) }
    val threads = (0 until 8).map(_ => new Thread(() => {
      var j = 0
      while (j < 10000) { val v = j % 64; assert(c.get(v)(0) == v); j += 1 }
    }))
    threads.foreach(_.start()); threads.foreach(_.join())
    c.release()
    assert(c.size == 64)
  }
}
