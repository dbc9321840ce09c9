package repro.ml

import repro.data.StreamGen.Obs

/** Ordinary least squares for the two-feature, no-intercept model of §6.3:
  * y = b1·x1 + b2·x2 + ε, fit in closed form via the 2×2 normal equations.
  */
object Ols {

  /** Fitted coefficients (b1, b2); (0,0) when the system is degenerate. */
  def fit(train: IndexedSeq[Obs]): (Double, Double) = {
    var s11 = 0.0; var s12 = 0.0; var s22 = 0.0; var s1y = 0.0; var s2y = 0.0
    train.foreach { o =>
      s11 += o.x1 * o.x1; s12 += o.x1 * o.x2; s22 += o.x2 * o.x2
      s1y += o.x1 * o.y; s2y += o.x2 * o.y
    }
    val det = s11 * s22 - s12 * s12
    if (math.abs(det) < 1e-12) (0.0, 0.0)
    else ((s22 * s1y - s12 * s2y) / det, (s11 * s2y - s12 * s1y) / det)
  }

  /** Mean squared prediction error of the sample-fit model on a test batch. */
  def mse(train: IndexedSeq[Obs], test: IndexedSeq[Obs]): Double = {
    if (test.isEmpty) return 0.0
    val (b1, b2) = fit(train)
    test.map { o =>
      val e = o.y - (b1 * o.x1 + b2 * o.x2)
      e * e
    }.sum / test.size
  }
}
