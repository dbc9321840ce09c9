package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tests for B-Chao (Appendix D): sample-size invariant, approximate
  * correctness in the fast-arrival steady state, and — crucially — the
  * characterization tests demonstrating the paper's point that B-Chao
  * VIOLATES the relative-inclusion property (1) during fill-up and under
  * slow arrivals (overweight items).
  */
class BChaoSpec extends AnyFunSuite {

  private def mkBatch(t: Int, size: Int): IndexedSeq[Item[Int]] =
    (0 until size).map(i => Item(t.toLong * 1000000 + i, t, i))

  test("sample size is exactly n once filled, forever (nondecreasing)") {
    val c = new BChao[Int](30, 0.4, 1)
    c.processBatch(mkBatch(1, 10))
    assert(c.sample.size == 10)
    c.processBatch(mkBatch(2, 10))
    assert(c.sample.size == 20)
    c.processBatch(mkBatch(3, 25))
    assert(c.sample.size == 30)
    // Starve it: unlike R-TBS the Chao sample can never shrink.
    (4 to 60).foreach(t => c.processBatch(if (t % 5 == 0) mkBatch(t, 1) else Vector.empty))
    assert(c.sample.size == 30, "B-Chao's sample size is nondecreasing by construction")
  }

  test("fast-arrival steady state approximately satisfies (1)") {
    val n = 30; val lambda = 0.1; val b = 20; val horizon = 25
    val reps = 3000
    val byBatch = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
    (1 to reps).foreach { rep =>
      val c = new BChao[Int](n, lambda, rep.toLong * 61 + 5)
      (1 to horizon).foreach(t => c.processBatch(mkBatch(t, b)))
      c.sample.foreach(it => byBatch(it.batch) += 1)
    }
    // Check adjacent-batch ratio ~ e^-lambda over the recent (well-mixed) past.
    val p = (horizon - 6 to horizon).map(t => byBatch(t).toDouble / (b.toLong * reps))
    (0 until p.size - 1).foreach { i =>
      val ratio = p(i) / p(i + 1)
      assert(math.abs(ratio - math.exp(-lambda)) < 0.1,
        s"adjacent ratio $ratio vs ${math.exp(-lambda)}")
    }
  }

  test("VIOLATION during fill-up: batches before saturation are equally represented") {
    // Two batches fill the reservoir exactly; property (1) demands the first
    // batch be underrepresented by e^-lambda, but B-Chao keeps everything.
    val n = 40; val lambda = 0.5
    val c = new BChao[Int](n, lambda, 7)
    c.processBatch(mkBatch(1, 20))
    c.processBatch(mkBatch(2, 20))
    val p1 = c.sample.count(_.batch == 1) / 20.0
    val p2 = c.sample.count(_.batch == 2) / 20.0
    // Both are 1.0 — ratio 1 instead of e^-0.5 = 0.607: (1) is violated.
    assert(p1 == 1.0 && p2 == 1.0)
    assert(math.abs(p1 / p2 - math.exp(-lambda)) > 0.3,
      "B-Chao violates (1) during fill-up, as Appendix D argues")
  }

  test("VIOLATION under slow arrivals: overweight new items are included w.p. 1") {
    // Saturate, then starve with single-item batches under strong decay: each
    // new item is overweight (n*1/W > 1) and must be accepted outright.
    val n = 20; val lambda = 1.0
    val c = new BChao[Int](n, lambda, 8)
    (1 to 5).foreach(t => c.processBatch(mkBatch(t, 10)))
    (6 to 15).foreach { t =>
      c.processBatch(mkBatch(t, 1))
      assert(c.sample.exists(_.batch == t), s"overweight item of batch $t must be in the sample")
    }
    assert(c.overweightCount > 0, "slow arrivals should leave overweight items tracked in V")
    // R-TBS by contrast would include late items with prob C_t/W_t < 1 while
    // shrinking the sample; B-Chao distorts towards recent items instead.
  }

  test("no overweight items under fast arrivals") {
    val c = new BChao[Int](20, 0.05, 9)
    (1 to 30).foreach(t => c.processBatch(mkBatch(t, 25)))
    assert(c.overweightCount == 0)
  }

  test("deterministic given the seed") {
    def run(seed: Long): Set[Long] = {
      val c = new BChao[Int](15, 0.2, seed)
      (1 to 20).foreach(t => c.processBatch(mkBatch(t, 8)))
      c.sample.map(_.id).toSet
    }
    assert(run(77) == run(77))
  }
}
