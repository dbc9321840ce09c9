package repro.ml

import org.scalatest.funsuite.AnyFunSuite

/** Tests for accuracy/robustness metrics, especially expected shortfall. */
class MetricsSpec extends AnyFunSuite {

  test("mean of empty series is 0") { assert(Metrics.mean(Nil) == 0.0) }
  test("mean is arithmetic") { assert(Metrics.mean(Seq(1.0, 2.0, 3.0)) == 2.0) }

  test("expected shortfall of the worst 10% of 30 values = worst 3 values") {
    val xs = (1 to 30).map(_.toDouble)
    // Worst (largest-loss) 3 values: 30, 29, 28.
    assert(Metrics.expectedShortfall(xs, 0.1) == (30.0 + 29 + 28) / 3)
  }

  test("expected shortfall with z=1 equals the mean") {
    val xs = Seq(5.0, 1.0, 3.0)
    assert(Metrics.expectedShortfall(xs, 1.0) == Metrics.mean(xs))
  }

  test("expected shortfall takes at least one element") {
    assert(Metrics.expectedShortfall(Seq(7.0, 1.0), 0.01) == 7.0)
  }

  test("expected shortfall of empty series is 0") {
    assert(Metrics.expectedShortfall(Nil, 0.1) == 0.0)
  }

  test("expected shortfall rejects invalid z") {
    intercept[IllegalArgumentException](Metrics.expectedShortfall(Seq(1.0), 0.0))
    intercept[IllegalArgumentException](Metrics.expectedShortfall(Seq(1.0), 1.5))
  }

  test("expected shortfall is monotone in z for sorted losses") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0, 5.0, 6.0, 7.0, 8.0, 9.0, 10.0)
    val es10 = Metrics.expectedShortfall(xs, 0.1)
    val es50 = Metrics.expectedShortfall(xs, 0.5)
    assert(es10 >= es50, "focusing on fewer, worse cases cannot lower the shortfall")
  }
}
