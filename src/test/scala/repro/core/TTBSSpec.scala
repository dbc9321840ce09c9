package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tests for T-TBS (Algorithm 1): inclusion probabilities, the Theorem 3.1
  * sample-size dynamics, and the parameter restriction b ≥ n(1−e^{-λ}).
  */
class TTBSSpec extends AnyFunSuite {

  private def mkBatch(t: Int, size: Int): IndexedSeq[Item[Int]] =
    (0 until size).map(i => Item(t.toLong * 1000000 + i, t, i))

  test("parameter restriction: rejects b < n(1-e^-lambda)") {
    // n=1000, lambda=0.1 -> n(1-p) = 95.2; b=50 is too small.
    intercept[IllegalArgumentException](new TTBS[Int](1000, 0.1, 50.0, 1))
  }

  test("q = n(1-e^-lambda)/b as in the paper") {
    val t = new TTBS[Int](100, 0.05, 50.0, 2)
    val expect = 100 * (1 - math.exp(-0.05)) / 50.0
    assert(math.abs(t.acceptProb - expect) < 1e-12)
    assert(math.abs(t.retentionProb - math.exp(-0.05)) < 1e-12)
  }

  test("Theorem 3.1(ii): E[C_t] converges to n (Monte Carlo)") {
    val n = 100; val lambda = 0.1; val b = 50
    val reps = 400; val horizon = 120
    var acc = 0.0
    (1 to reps).foreach { rep =>
      val t = new TTBS[Int](n, lambda, b, rep.toLong * 13 + 7)
      (1 to horizon).foreach(tt => t.processBatch(mkBatch(tt, b)))
      acc += t.sample.size
    }
    val mean = acc / reps
    assert(math.abs(mean - n) < 5.0, s"mean sample size $mean, expect ~$n")
  }

  test("Theorem 3.1(iii): time-averaged sample size converges to n") {
    val n = 200; val lambda = 0.05; val b = 40
    val t = new TTBS[Int](n, lambda, b, 11)
    var acc = 0.0; val horizon = 2000
    (1 to horizon).foreach { tt => t.processBatch(mkBatch(tt, b)); acc += t.sample.size }
    val avg = acc / horizon
    assert(math.abs(avg - n) < 10.0, s"time-average $avg, expect ~$n")
  }

  test("inclusion probability is q·e^(-lambda(t'-t)) — property (1) holds") {
    val n = 50; val lambda = 0.2; val b = 25
    val q = n * (1 - math.exp(-lambda)) / b
    val reps = 4000; val horizon = 8
    val byBatch = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
    (1 to reps).foreach { rep =>
      val t = new TTBS[Int](n, lambda, b, rep.toLong * 37 + 2)
      (1 to horizon).foreach(tt => t.processBatch(mkBatch(tt, b)))
      t.sample.foreach(it => byBatch(it.batch) += 1)
    }
    (1 to horizon).foreach { tt =>
      val got = byBatch(tt).toDouble / (b.toLong * reps)
      val expect = q * math.exp(-lambda * (horizon - tt))
      assert(math.abs(got - expect) < 0.03, s"batch $tt: p=$got expect=$expect")
    }
  }

  test("sample size can exceed n (no hard bound) under growing batches") {
    val n = 100; val lambda = 0.05
    val t = new TTBS[Int](n, lambda, 100, 5)
    var batchSize = 100.0
    var overflowed = false
    (1 to 400).foreach { tt =>
      t.processBatch(mkBatch(tt, batchSize.toInt))
      batchSize *= 1.01 // the Figure 1(a) failure mode
      if (t.sample.size > 2 * n) overflowed = true
    }
    assert(overflowed, "T-TBS should overflow when batch sizes systematically grow")
  }

  test("empty batches shrink the sample geometrically") {
    val t = new TTBS[Int](100, 0.3, 100, 6)
    (1 to 10).foreach(tt => t.processBatch(mkBatch(tt, 100)))
    val before = t.sample.size
    (11 to 30).foreach(_ => t.processBatch(Vector.empty))
    assert(t.sample.size < before / 4)
  }

  test("B-TBS equals T-TBS with q=1: size drifts to b/(1-p)") {
    val lambda = 0.1; val b = 20
    val bt = new BTBS[Int](lambda, 21)
    (1 to 300).foreach(tt => bt.processBatch(mkBatch(tt, b)))
    val expect = b / (1 - math.exp(-lambda)) // Remark 1
    assert(math.abs(bt.sample.size - expect) < 0.35 * expect,
      s"size=${bt.sample.size} expect~$expect")
  }

  test("B-TBS inclusion probability is e^(-lambda(t'-t))") {
    val lambda = 0.25; val b = 10; val horizon = 10
    val reps = 4000
    val byBatch = scala.collection.mutable.Map.empty[Int, Long].withDefaultValue(0L)
    (1 to reps).foreach { rep =>
      val bt = new BTBS[Int](lambda, rep.toLong * 41 + 9)
      (1 to horizon).foreach(tt => bt.processBatch(mkBatch(tt, b)))
      bt.sample.foreach(it => byBatch(it.batch) += 1)
    }
    (1 to horizon).foreach { tt =>
      val got = byBatch(tt).toDouble / (b.toLong * reps)
      val expect = math.exp(-lambda * (horizon - tt))
      assert(math.abs(got - expect) < 0.03, s"batch $tt: p=$got expect=$expect")
    }
  }
}
