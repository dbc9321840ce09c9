package repro.exp

import repro.core._
import repro.data.StreamGen
import repro.data.StreamGen._
import repro.data.TextStream
import repro.ml.{Knn, Metrics, NaiveBayes, Ols}

/** Concrete experiment definitions for §6.2–§6.4, shared by unit tests, the
  * bench suites, and the spark-submit jobs so that the published numbers all
  * come from one code path.
  */
object Experiments {

  /** The sampling schemes compared in Table 1 (kNN): R-TBS at several decay
    * rates, the sliding window, and the uniform reservoir, all with the same
    * maximum sample size n ("all methods use the same amount of data").
    */
  def knnSchemes(n: Int, lambdas: Seq[Double] = Seq(0.05, 0.07, 0.1))
      : Seq[(String, Long => Sampler[Point])] =
    lambdas.map(l => (f"R-TBS λ=$l%.2f", (s: Long) => new RTBS[Point](n, l, s): Sampler[Point])) ++
      Seq(
        ("SW", (_: Long) => new SlidingWindow[Point](n): Sampler[Point]),
        ("Unif", (s: Long) => new BRS[Point](n, s): Sampler[Point]),
      )

  /** One kNN quality experiment (Table 1 / Fig 10 / Fig 11 protocol). */
  def knn(mkSampler: Long => Sampler[Point], pattern: Pattern, regime: BatchRegime,
          cfg: QualityHarness.Config, runs: Int, seed: Long, k: Int = 7): QualityHarness.SchemeResult = {
    val factory = (runSeed: Long) => {
      val mix = new GaussianMixture(runSeed ^ 0xC0FFEE)
      (t: Int, size: Int, rng: Rng, idBase: Long) =>
        StreamGen.knnBatch(mix, if (t <= 0) neverAbnormal else pattern, math.max(t, 1), size, rng, idBase)
    }
    QualityHarness.evaluate[Point](
      mkSampler, factory, regime,
      (sample, batch) => Knn.missRate(sample, batch, k),
      cfg, runs, seed)
  }

  /** One linear-regression quality experiment (§6.3 protocol). */
  def regression(mkSampler: Long => Sampler[Obs], pattern: Pattern, regime: BatchRegime,
                 cfg: QualityHarness.Config, runs: Int, seed: Long): QualityHarness.SchemeResult = {
    val factory = (_: Long) =>
      (t: Int, size: Int, rng: Rng, idBase: Long) =>
        StreamGen.regBatch(if (t <= 0) neverAbnormal else pattern, math.max(t, 1), size, rng, idBase)
    QualityHarness.evaluate[Obs](mkSampler, factory, regime, Ols.mse, cfg, runs, seed)
  }

  /** The Naive Bayes / Usenet2 experiment (§6.4): no warm-up, 30 batches of
    * 50 messages, 20% ES over all batches. Returns (missRate%, es%) per
    * scheme name, averaged over `runs` regenerated streams.
    */
  def naiveBayes(schemes: Seq[(String, Long => Sampler[TextStream.Message])],
                 runs: Int, seed: Long): Seq[(String, Double, Double)] = {
    schemes.map { case (name, mk) =>
      val perRun = (1 to runs).map { run =>
        val runSeed = seed + run * 7919L
        val batches = TextStream.stream(runSeed)
        val sampler = mk(runSeed)
        val losses = batches.map { batch =>
          val l = NaiveBayes.missRate(
            sampler.sample.map(_.payload), batch.map(_.payload), TextStream.VocabSize)
          sampler.processBatch(batch)
          l
        }
        (Metrics.mean(losses), Metrics.expectedShortfall(losses, 0.2))
      }
      (name, 100 * Metrics.mean(perRun.map(_._1)), 100 * Metrics.mean(perRun.map(_._2)))
    }
  }

  /** A pattern that never leaves normal mode (used for warm-up generation). */
  val neverAbnormal: Pattern = SingleEvent(start = Int.MaxValue, end = Int.MaxValue)

  /** Paper window for kNN Table 1: 100-batch warm-up, ES from t=20, 10% ES.
    * Horizon 30 for the single event (Fig 10(a)), 60 for periodic patterns.
    */
  def knnConfig(horizon: Int): QualityHarness.Config =
    QualityHarness.Config(warmup = 100, horizon = horizon, accFrom = 1, esFrom = 20, esZ = 0.1)

  /** Render an aligned plain-text table (benches print these next to the
    * paper's numbers; EXPERIMENTS.md holds the authoritative diff).
    */
  def formatTable(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }
}
