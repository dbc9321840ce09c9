package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tests for the count-based sliding-window baseline. */
class SlidingWindowSpec extends AnyFunSuite {

  private def mkBatch(t: Int, size: Int): IndexedSeq[Item[Int]] =
    (0 until size).map(i => Item(t.toLong * 1000 + i, t, i))

  test("holds exactly the last n items in order") {
    val w = new SlidingWindow[Int](5)
    w.processBatch(mkBatch(1, 3))
    assert(w.sample.map(_.id) == Vector(1000L, 1001L, 1002L))
    w.processBatch(mkBatch(2, 4))
    assert(w.sample.size == 5)
    assert(w.sample.map(_.id) == Vector(1002L, 2000L, 2001L, 2002L, 2003L))
  }

  test("a batch larger than the window keeps only its tail") {
    val w = new SlidingWindow[Int](4)
    w.processBatch(mkBatch(1, 10))
    assert(w.sample.map(_.id) == Vector(1006L, 1007L, 1008L, 1009L))
  }

  test("empty batches change nothing") {
    val w = new SlidingWindow[Int](3)
    w.processBatch(mkBatch(1, 3))
    val before = w.sample
    w.processBatch(Vector.empty)
    assert(w.sample == before)
  }

  test("old items are completely forgotten — the non-robustness the paper exploits") {
    val w = new SlidingWindow[Int](100)
    w.processBatch(mkBatch(1, 100))
    (2 to 3).foreach(t => w.processBatch(mkBatch(t, 50)))
    assert(!w.sample.exists(_.batch == 1), "batch 1 must be fully evicted")
  }
}
