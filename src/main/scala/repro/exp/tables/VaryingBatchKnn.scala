package repro.exp.tables

import repro.data.StreamGen._
import repro.exp.Experiments

/** §6.2 "Varying batch size": kNN under Uniform(0,200) and 2%-growing batch
  * sizes, λ=0.07, Periodic(10,10). The paper reports the ratios of SW and
  * Unif to R-TBS: Miss 1.16x/1.14x (SW), 1.47x/1.40x (Unif); ES 1.82x/1.98x
  * (SW), 1.76x/1.78x (Unif).
  */
object VaryingBatchKnn {

  val regimes: Seq[BatchRegime] = Seq(UniformBatch(100), GeometricBatch(100, 1.02))

  /** Per regime: (regimeName, scheme -> (miss%, es%)). */
  final case class RegimeResult(regime: String, byScheme: Seq[(String, Double, Double)])

  def compute(runs: Int, seed: Long = 4242, n: Int = 1000): Seq[RegimeResult] = {
    val schemes = Experiments.knnSchemes(n, lambdas = Seq(0.07))
    regimes.map { regime =>
      val rows = schemes.map { case (name, mk) =>
        val res = Experiments.knn(mk, Periodic(10, 10), regime,
          Experiments.knnConfig(60), runs, seed)
        (name, 100 * res.accuracy, 100 * res.es)
      }
      RegimeResult(regime.name, rows)
    }
  }

  def render(results: Seq[RegimeResult]): String = {
    results.map { rr =>
      val rtbs = rr.byScheme.head
      val body = rr.byScheme.map { case (name, m, e) =>
        Seq(name, f"$m%.1f", f"$e%.1f", f"${m / rtbs._2}%.2fx", f"${e / rtbs._3}%.2fx")
      }
      s"Batch regime: ${rr.regime}\n" +
        Experiments.formatTable(
          Seq("Scheme", "Miss%", "ES%", "Miss/R-TBS", "ES/R-TBS"), body)
    }.mkString("\n\n")
  }
}
