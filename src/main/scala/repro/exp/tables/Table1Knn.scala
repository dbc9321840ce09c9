package repro.exp.tables

import repro.data.StreamGen._
import repro.exp.{Experiments, QualityHarness}

/** Table 1: accuracy (Miss%) and robustness (10% ES) of the kNN classifier
  * for R-TBS (λ ∈ {0.05, 0.07, 0.1}), SW and Unif over four temporal
  * patterns, averaged over `runs` runs (paper: 30). b=100 constant batches,
  * n=1000, k=7, 100-batch warm-up, ES from t=20.
  */
object Table1Knn {

  /** Temporal patterns evaluated (with their horizons). */
  val patterns: Seq[(Pattern, Int)] = Seq(
    (SingleEvent(10, 20), 30),
    (Periodic(10, 10), 60),
    (Periodic(10, 5), 60),
    (Periodic(16, 16), 64),
  )

  /** One row: scheme name -> per-pattern (miss%, es%). */
  final case class Row(scheme: String, cells: Seq[(Double, Double)])

  def compute(runs: Int, seed: Long = 2018, n: Int = 1000): Seq[Row] = {
    val schemes = Experiments.knnSchemes(n)
    schemes.map { case (name, mk) =>
      val cells = patterns.map { case (pattern, horizon) =>
        val res = Experiments.knn(mk, pattern, ConstantBatch(100),
          Experiments.knnConfig(horizon), runs, seed)
        (100 * res.accuracy, 100 * res.es)
      }
      Row(name, cells)
    }
  }

  def render(rows: Seq[Row]): String = {
    val header = "Scheme" +: patterns.flatMap { case (p, _) =>
      Seq(s"${p.name} Miss%", s"${p.name} ES%")
    }
    val body = rows.map(r => r.scheme +: r.cells.flatMap { case (m, e) =>
      Seq(f"$m%.1f", f"$e%.1f")
    })
    Experiments.formatTable(header, body)
  }
}
