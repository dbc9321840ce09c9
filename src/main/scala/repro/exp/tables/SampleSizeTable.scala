package repro.exp.tables

import repro.core.{Item, RTBS, Rng, TTBS}
import repro.exp.Experiments

/** Figure 1 as a table: sample-size behaviour of T-TBS vs R-TBS under the
  * four batch-size regimes of the paper, n = 1000.
  *
  *   (a) growth: B fixed at 100 until t=200, then B_{t+1} = 1.002·B_t, λ=0.05
  *       — T-TBS overflows, R-TBS pinned at n;
  *   (b) constant B=100, λ=0.1 — T-TBS fluctuates around n, R-TBS constant;
  *   (c) Uniform[0,200], λ=0.1 — T-TBS fluctuates widely, R-TBS bounded
  *       above but dips when W < n;
  *   (d) decay: B fixed until t=200 then ×0.8 per step, λ=0.01 — both shrink,
  *       R-TBS more gracefully.
  */
object SampleSizeTable {

  final case class RegimeStats(regime: String, scheme: String,
                               meanPre: Double, meanPost: Double,
                               sd: Double, maxSize: Long, minPost: Long, finalSize: Long)

  private def mkBatch(t: Int, size: Int): IndexedSeq[Item[Unit]] =
    (0 until size).map(i => Item(t.toLong * 1000000 + i, t, ()))

  /** Batch size schedules over t = 1..horizon (deterministic per seed). */
  private def schedule(regime: String, horizon: Int, rng: Rng): IndexedSeq[Int] = regime match {
    case "(a) growth phi=1.002" =>
      var b = 100.0
      (1 to horizon).map { t => if (t > 200) b *= 1.002; math.round(b).toInt }
    case "(b) constant B=100" => IndexedSeq.fill(horizon)(100)
    case "(c) Uniform[0,200]" => (1 to horizon).map(_ => rng.nextInt(201))
    case "(d) decay phi=0.8" =>
      var b = 100.0
      (1 to horizon).map { t => if (t > 200) b *= 0.8; math.round(b).toInt }
    case other => throw new IllegalArgumentException(other)
  }

  val regimes: Seq[(String, Double)] = Seq( // (regime, lambda) as in Fig 1
    ("(a) growth phi=1.002", 0.05),
    ("(b) constant B=100", 0.1),
    ("(c) Uniform[0,200]", 0.1),
    ("(d) decay phi=0.8", 0.01),
  )

  def compute(horizon: Int = 600, n: Int = 1000, seed: Long = 99): Seq[RegimeStats] = {
    regimes.flatMap { case (regime, lambda) =>
      val sizesSchedule = schedule(regime, horizon, new Rng(seed))
      val b = 100.0
      Seq("T-TBS", "R-TBS").map { scheme =>
        val sampler = scheme match {
          case "T-TBS" => new TTBS[Unit](n, lambda, b, seed + 1)
          case _       => new RTBS[Unit](n, lambda, seed + 2)
        }
        val sizes = sizesSchedule.zipWithIndex.map { case (bs, i) =>
          sampler.processBatch(mkBatch(i + 1, bs))
          sampler.sample.size.toLong
        }
        val pre = sizes.slice(100, 200).map(_.toDouble) // settled, pre-change
        val post = sizes.drop(400).map(_.toDouble)
        val meanPre = pre.sum / pre.size
        val meanPost = post.sum / post.size
        val sd = math.sqrt(pre.map(x => (x - meanPre) * (x - meanPre)).sum / pre.size)
        RegimeStats(regime, scheme, meanPre, meanPost, sd, sizes.max, sizes.drop(400).min, sizes.last)
      }
    }
  }

  def render(stats: Seq[RegimeStats]): String =
    Experiments.formatTable(
      Seq("Regime (lambda)", "Scheme", "mean size t=100-200", "sd (pre)", "mean size t>400",
        "max", "min t>400", "final"),
      stats.map(s => Seq(s.regime, s.scheme, f"${s.meanPre}%.0f", f"${s.sd}%.1f",
        f"${s.meanPost}%.0f", s.maxSize.toString, s.minPost.toString, s.finalSize.toString)))
}
