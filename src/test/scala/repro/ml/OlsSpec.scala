package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Rng
import repro.data.StreamGen.{Obs, RegressionModel}

/** Tests for the closed-form OLS substrate. */
class OlsSpec extends AnyFunSuite {

  test("recovers exact coefficients from noiseless data") {
    val rng = new Rng(1)
    val data = Vector.fill(50) {
      val x1 = rng.uniform(); val x2 = rng.uniform()
      Obs(x1, x2, 2.5 * x1 - 1.5 * x2)
    }
    val (b1, b2) = Ols.fit(data)
    assert(math.abs(b1 - 2.5) < 1e-9 && math.abs(b2 + 1.5) < 1e-9)
  }

  test("recovers paper's normal-mode coefficients from noisy data") {
    val rng = new Rng(2)
    val data = Vector.fill(20000)(RegressionModel.draw(abnormal = false, rng))
    val (b1, b2) = Ols.fit(data)
    assert(math.abs(b1 - 4.2) < 0.15, s"b1=$b1")
    assert(math.abs(b2 + 0.4) < 0.15, s"b2=$b2")
  }

  test("recovers paper's abnormal-mode coefficients") {
    val rng = new Rng(3)
    val data = Vector.fill(20000)(RegressionModel.draw(abnormal = true, rng))
    val (b1, b2) = Ols.fit(data)
    assert(math.abs(b1 + 3.6) < 0.15, s"b1=$b1")
    assert(math.abs(b2 - 3.8) < 0.15, s"b2=$b2")
  }

  test("degenerate design matrix yields (0,0) instead of NaN") {
    val data = Vector.fill(5)(Obs(0.0, 0.0, 1.0))
    assert(Ols.fit(data) == (0.0, 0.0))
  }

  test("mse is ~noise variance when trained and tested on the same mode") {
    val rng = new Rng(4)
    val train = Vector.fill(5000)(RegressionModel.draw(abnormal = false, rng))
    val test = Vector.fill(5000)(RegressionModel.draw(abnormal = false, rng))
    val m = Ols.mse(train, test)
    assert(math.abs(m - 1.0) < 0.15, s"mse=$m") // ε ~ N(0,1) -> MSE ≈ 1
  }

  test("mse blows up across a mode change — why retraining matters") {
    val rng = new Rng(5)
    val train = Vector.fill(5000)(RegressionModel.draw(abnormal = false, rng))
    val test = Vector.fill(5000)(RegressionModel.draw(abnormal = true, rng))
    assert(Ols.mse(train, test) > 5.0)
  }

  test("mse of empty test batch is zero") {
    assert(Ols.mse(Vector(Obs(1, 1, 1)), Vector.empty) == 0.0)
  }
}
