package repro.ml

/** Evaluation metrics of §6.2: average loss ("accuracy") and z% expected
  * shortfall ("robustness") — the average of the worst z% of per-batch losses
  * [27, p.70].
  */
object Metrics {

  /** Mean of a loss series. */
  def mean(xs: Seq[Double]): Double =
    if (xs.isEmpty) 0.0 else xs.sum / xs.size

  /** z% expected shortfall: the mean of the worst ⌈z·|xs|⌉ values, where
    * "worst" means largest loss. z is a fraction in (0, 1].
    */
  def expectedShortfall(xs: Seq[Double], z: Double): Double = {
    require(z > 0 && z <= 1, s"z=$z must be a fraction in (0,1]")
    if (xs.isEmpty) return 0.0
    val k = math.max(1, math.ceil(z * xs.size).toInt)
    val worst = xs.sorted(Ordering[Double].reverse).take(k)
    worst.sum / worst.size
  }
}
