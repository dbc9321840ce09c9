package repro.exp.tables

import repro.core._
import repro.data.StreamGen._
import repro.exp.{Experiments, QualityHarness}

/** §6.3 linear regression (Fig 12): MSE and 10% ES under
  *   (a) saturated samples, n=1000, Periodic(10,10)
  *       — paper: MSE 3.51 (R-TBS), 4.02 (SW), 4.43 (Unif);
  *                ES 6.04 (R-TBS), 10.94 (SW), 10.05 (Unif);
  *   (b) unsaturated, n=1600, Periodic(10,10)
  *       — paper: MSE 3.50 vs 4.17 (SW); ES 5.97 vs 5.86 (SW);
  *         R-TBS reservoir stabilizes at ≈1479 < 1600;
  *   (c) unsaturated, n=1600, Periodic(16,16) — SW suffers again.
  * λ = 0.07, b = 100 constant.
  */
object RegressionTables {

  final case class Scenario(name: String, n: Int, pattern: Pattern, horizon: Int)

  val scenarios: Seq[Scenario] = Seq(
    Scenario("saturated n=1000, P(10,10)", 1000, Periodic(10, 10), 60),
    Scenario("unsaturated n=1600, P(10,10)", 1600, Periodic(10, 10), 60),
    Scenario("unsaturated n=1600, P(16,16)", 1600, Periodic(16, 16), 64),
  )

  final case class ScenarioResult(scenario: String, byScheme: Seq[(String, Double, Double)],
                                  rtbsStableSize: Double)

  private def schemes(n: Int): Seq[(String, Long => Sampler[Obs])] = Seq(
    ("R-TBS λ=0.07", (s: Long) => new RTBS[Obs](n, 0.07, s)),
    ("SW", (_: Long) => new SlidingWindow[Obs](n)),
    ("Unif", (s: Long) => new BRS[Obs](n, s)),
  )

  def compute(runs: Int, seed: Long = 63): Seq[ScenarioResult] = {
    scenarios.map { sc =>
      val cfg = QualityHarness.Config(warmup = 100, horizon = sc.horizon,
        accFrom = 1, esFrom = 20, esZ = 0.1)
      val rows = schemes(sc.n).map { case (name, mk) =>
        val res = Experiments.regression(mk, sc.pattern, ConstantBatch(100), cfg, runs, seed)
        (name, res.accuracy, res.es)
      }
      // The steady-state R-TBS sample weight: min(n, b/(1-e^-lambda)).
      val stable = math.min(sc.n.toDouble, 100.0 / (1.0 - math.exp(-0.07)))
      ScenarioResult(sc.name, rows, stable)
    }
  }

  def render(results: Seq[ScenarioResult]): String =
    results.map { rr =>
      s"Scenario: ${rr.scenario}  (R-TBS steady-state sample weight: ${f"${rr.rtbsStableSize}%.0f"})\n" +
        Experiments.formatTable(
          Seq("Scheme", "MSE", "10% ES"),
          rr.byScheme.map { case (n, m, e) => Seq(n, f"$m%.2f", f"$e%.2f") })
    }.mkString("\n\n")
}
