package repro.exp.tables

import repro.core._
import repro.data.TextStream.Message
import repro.exp.Experiments

/** §6.4 Naive Bayes on the (synthetic) Usenet2 stream: Miss% and 20% ES for
  * R-TBS (λ=0.3, n=300), SW (300) and Unif (300); batch 50, 30 batches, no
  * warm-up. Paper: Miss 26.5 / 30.0 / 29.5; ES 43.3 / 52.7 / 42.7.
  */
object NaiveBayesTable {

  def schemes: Seq[(String, Long => Sampler[Message])] = Seq(
    ("R-TBS λ=0.3", (s: Long) => new RTBS[Message](300, 0.3, s)),
    ("SW", (_: Long) => new SlidingWindow[Message](300)),
    ("Unif", (s: Long) => new BRS[Message](300, s)),
  )

  def compute(runs: Int, seed: Long = 64): Seq[(String, Double, Double)] =
    Experiments.naiveBayes(schemes, runs, seed)

  def render(rows: Seq[(String, Double, Double)]): String =
    Experiments.formatTable(
      Seq("Scheme", "Miss%", "20% ES%"),
      rows.map { case (n, m, e) => Seq(n, f"$m%.1f", f"$e%.1f") })
}
