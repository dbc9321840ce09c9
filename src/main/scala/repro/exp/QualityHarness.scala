package repro.exp

import repro.core.{Item, Rng, Sampler}
import repro.data.StreamGen.BatchRegime
import repro.ml.Metrics

/** Prequential ("test-then-train") evaluation harness for §6.2–§6.4.
  *
  * For each run: warm the sampler up on `warmup` normal-mode batches, then
  * for t = 1..horizon generate a batch per the temporal pattern and batch
  * regime, score the model trained on the *current* sample against the
  * incoming batch, and finally feed the batch to the sampler. Accuracy is the
  * mean per-batch loss over [accFrom, horizon]; robustness is the z% expected
  * shortfall of the per-batch losses over [esFrom, horizon], averaged across
  * runs (the paper's Table 1 protocol: 30 runs, ES from t = 20).
  */
object QualityHarness {

  /** Experiment window configuration. */
  final case class Config(warmup: Int, horizon: Int, accFrom: Int, esFrom: Int, esZ: Double)

  /** Aggregated outcome for one sampling scheme.
    *
    * @param accuracy mean per-batch loss over [accFrom, horizon], averaged over runs
    * @param es       mean z% expected shortfall over [esFrom, horizon] across runs
    * @param trace    per-batch loss averaged across runs (for Figure-style tables)
    */
  final case class SchemeResult(accuracy: Double, es: Double, trace: Vector[Double])

  /** Run `runs` independent repetitions of one scheme.
    *
    * @param mkSampler      sampler factory, seeded per run
    * @param mkBatchFactory per-run batch generator factory (lets each run draw
    *                       its own ground truth, e.g. fresh class centroids);
    *                       the generator maps (t, size, rng, idBase) => batch,
    *                       with t ≤ 0 denoting warm-up (normal mode)
    * @param regime         batch-size regime (base size used during warm-up)
    * @param loss           (sample payloads, incoming payloads) => per-batch loss
    */
  def evaluate[P](mkSampler: Long => Sampler[P],
                  mkBatchFactory: Long => (Int, Int, Rng, Long) => IndexedSeq[Item[P]],
                  regime: BatchRegime,
                  loss: (IndexedSeq[P], IndexedSeq[P]) => Double,
                  cfg: Config, runs: Int, seed: Long): SchemeResult = {
    require(runs > 0 && cfg.horizon >= cfg.esFrom && cfg.accFrom >= 1)
    val perRun = (1 to runs).map { run =>
      val runSeed = seed + run * 1000003L
      singleRun(mkSampler, mkBatchFactory(runSeed), regime, loss, cfg, runSeed)
    }
    val accuracy = Metrics.mean(perRun.map(l => Metrics.mean(l.drop(cfg.accFrom - 1))))
    val es = Metrics.mean(perRun.map(l => Metrics.expectedShortfall(l.drop(cfg.esFrom - 1), cfg.esZ)))
    val trace = Vector.tabulate(cfg.horizon)(i => Metrics.mean(perRun.map(_(i))))
    SchemeResult(accuracy, es, trace)
  }

  /** One prequential run; returns the per-batch loss series of length horizon. */
  def singleRun[P](mkSampler: Long => Sampler[P],
                   mkBatch: (Int, Int, Rng, Long) => IndexedSeq[Item[P]],
                   regime: BatchRegime,
                   loss: (IndexedSeq[P], IndexedSeq[P]) => Double,
                   cfg: Config, runSeed: Long): Vector[Double] = {
    val sampler = mkSampler(runSeed)
    val dataRng = new Rng(runSeed ^ 0x5DEECE66DL)
    val sizeRng = new Rng(runSeed ^ 0x2545F4914F6CDD1DL)
    var idBase = 0L
    // Warm-up: normal mode, base batch size, no scoring.
    (-cfg.warmup + 1 to 0).foreach { t =>
      val batch = mkBatch(t, regime.base, dataRng, idBase)
      idBase += batch.size
      sampler.processBatch(batch)
    }
    (1 to cfg.horizon).map { t =>
      val size = regime.sizeAt(t, sizeRng)
      val batch = mkBatch(t, size, dataRng, idBase)
      idBase += batch.size
      val l = loss(sampler.sample.map(_.payload), batch.map(_.payload))
      sampler.processBatch(batch)
      l
    }.toVector
  }
}
