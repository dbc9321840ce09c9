package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tests for batched reservoir sampling (Algorithm 5): size bound and
  * uniformity over everything seen, independent of arrival batch.
  */
class BRSSpec extends AnyFunSuite {

  private def mkBatch(t: Int, size: Int): IndexedSeq[Item[Int]] =
    (0 until size).map(i => Item(t.toLong * 1000000 + i, t, i))

  test("sample is bounded by n and fills exactly while unsaturated") {
    val r = new BRS[Int](25, 1)
    r.processBatch(mkBatch(1, 10))
    assert(r.sample.size == 10)
    r.processBatch(mkBatch(2, 10))
    assert(r.sample.size == 20)
    r.processBatch(mkBatch(3, 10))
    assert(r.sample.size == 25)
    (4 to 30).foreach(t => r.processBatch(mkBatch(t, 50)))
    assert(r.sample.size == 25)
    assert(r.itemsSeen == 10 + 10 + 10 + 27 * 50)
  }

  test("uniform over all items seen: equal inclusion prob for every batch") {
    val n = 20; val b = 15; val horizon = 8
    val reps = 4000
    val byBatch = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
    (1 to reps).foreach { rep =>
      val r = new BRS[Int](n, rep.toLong * 53 + 1)
      (1 to horizon).foreach(t => r.processBatch(mkBatch(t, b)))
      r.sample.foreach(it => byBatch(it.batch) += 1)
    }
    val expect = n.toDouble / (b * horizon)
    (1 to horizon).foreach { t =>
      val got = byBatch(t).toDouble / (b.toLong * reps)
      assert(math.abs(got - expect) < 0.025, s"batch $t: p=$got expect=$expect")
    }
  }

  test("empty batches leave the sample untouched") {
    val r = new BRS[Int](10, 2)
    r.processBatch(mkBatch(1, 10))
    val before = r.sample.map(_.id).toSet
    r.processBatch(Vector.empty)
    assert(r.sample.map(_.id).toSet == before)
  }

  test("single giant batch yields a uniform subsample of it") {
    val r = new BRS[Int](5, 3)
    r.processBatch(mkBatch(1, 100))
    assert(r.sample.size == 5)
    assert(r.sample.map(_.id).distinct.size == 5)
  }
}
