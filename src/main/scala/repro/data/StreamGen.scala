package repro.data

import repro.core.{Item, Rng}

/** Generators for the evolving data streams of §6.2–§6.3: a Gaussian-mixture
  * classification stream and a two-feature linear-regression stream, each
  * operating in a "normal" or "abnormal" mode, plus the temporal patterns and
  * batch-size regimes used by the experiments.
  */
object StreamGen {

  /** A labeled 2-D point for the kNN experiment. */
  final case class Point(x: Double, y: Double, label: Int)

  /** A regression observation (x1, x2, y) for the OLS experiment. */
  final case class Obs(x1: Double, x2: Double, y: Double)

  /** Temporal mode pattern: which mode is active at (post-warm-up) time t ≥ 1. */
  sealed trait Pattern { def abnormalAt(t: Int): Boolean; def name: String }

  /** §6.2 "single change": normal up to `start`, abnormal in (start, end], then
    * normal again. Paper uses start=10, end=20.
    */
  final case class SingleEvent(start: Int = 10, end: Int = 20) extends Pattern {
    def abnormalAt(t: Int): Boolean = t > start && t <= end
    def name: String = "Single Event"
  }

  /** §6.2 "periodic change" P(δ,η): δ normal batches alternate with η abnormal. */
  final case class Periodic(delta: Int, eta: Int) extends Pattern {
    def abnormalAt(t: Int): Boolean = {
      val pos = ((t - 1) % (delta + eta)) + 1
      pos > delta
    }
    def name: String = s"P($delta,$eta)"
  }

  /** Batch-size regime. `sizeAt(t)` gives |B_t| for post-warm-up time t;
    * warm-up batches always use the base size b.
    */
  sealed trait BatchRegime {
    /** Base (warm-up / nominal mean) batch size b. */
    def base: Int
    def sizeAt(t: Int, rng: Rng): Int
    def name: String
  }

  /** Deterministic constant batches (Table 1). */
  final case class ConstantBatch(b: Int) extends BatchRegime {
    def base: Int = b
    def sizeAt(t: Int, rng: Rng): Int = b
    def name: String = s"const($b)"
  }

  /** i.i.d. Uniform(0, 2b) batch sizes (Fig 1(c), Fig 11(a)). */
  final case class UniformBatch(b: Int) extends BatchRegime {
    def base: Int = b
    def sizeAt(t: Int, rng: Rng): Int = rng.nextInt(2 * b + 1)
    def name: String = s"uniform(0,${2 * b})"
  }

  /** Geometric growth/decay B_{t+1} = φ·B_t after warm-up (Fig 1(a,d), Fig 11(b)). */
  final case class GeometricBatch(b: Int, phi: Double) extends BatchRegime {
    def base: Int = b
    def sizeAt(t: Int, rng: Rng): Int = math.max(0, math.round(b * math.pow(phi, t)).toInt)
    def name: String = f"geom($b,phi=$phi%.3f)"
  }

  /** The kNN data model of §6.2: 100 class centroids uniform in [0,80]²;
    * normal mode draws classes 1–50 five times as often as 51–100, abnormal
    * mode inverts the ratio; coordinates are N(centroid, 1).
    */
  final class GaussianMixture(seed: Long, nClasses: Int = 100) {
    private val centroidRng = new Rng(seed)
    /** Fixed ground-truth centroids, shared across modes and runs with this seed. */
    val centroids: IndexedSeq[(Double, Double)] =
      IndexedSeq.fill(nClasses)((centroidRng.uniform() * 80.0, centroidRng.uniform() * 80.0))

    /** Draw one labeled point in the given mode. */
    def draw(abnormal: Boolean, rng: Rng): Point = {
      val half = nClasses / 2
      // Frequent half has 5x the weight of the infrequent half.
      val firstHalfWeight = if (abnormal) 1.0 else 5.0
      val secondHalfWeight = if (abnormal) 5.0 else 1.0
      val total = half * firstHalfWeight + (nClasses - half) * secondHalfWeight
      val u = rng.uniform() * total
      val cls =
        if (u < half * firstHalfWeight) (u / firstHalfWeight).toInt
        else half + ((u - half * firstHalfWeight) / secondHalfWeight).toInt
      val (cx, cy) = centroids(math.min(cls, nClasses - 1))
      Point(cx + rng.gaussian(), cy + rng.gaussian(), math.min(cls, nClasses - 1))
    }
  }

  /** The regression data model of §6.3: y = b1·x1 + b2·x2 + ε with ε ~ N(0,1),
    * x1, x2 ~ Uniform(0,1); (b1,b2) = (4.2,−0.4) normal, (−3.6,3.8) abnormal.
    */
  object RegressionModel {
    val normalCoefs: (Double, Double) = (4.2, -0.4)
    val abnormalCoefs: (Double, Double) = (-3.6, 3.8)

    def draw(abnormal: Boolean, rng: Rng): Obs = {
      val (b1, b2) = if (abnormal) abnormalCoefs else normalCoefs
      val x1 = rng.uniform(); val x2 = rng.uniform()
      Obs(x1, x2, b1 * x1 + b2 * x2 + rng.gaussian())
    }
  }

  /** Materialize a batch of `size` items at time `t` in mode given by `pattern`. */
  def knnBatch(mix: GaussianMixture, pattern: Pattern, t: Int, size: Int,
               rng: Rng, idBase: Long): IndexedSeq[Item[Point]] =
    (0 until size).map(i => Item(idBase + i, t, mix.draw(pattern.abnormalAt(t), rng)))

  /** Materialize a regression batch analogously. */
  def regBatch(pattern: Pattern, t: Int, size: Int, rng: Rng, idBase: Long): IndexedSeq[Item[Obs]] =
    (0 until size).map(i => Item(idBase + i, t, RegressionModel.draw(pattern.abnormalAt(t), rng)))
}
