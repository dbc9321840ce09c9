package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Item, RTBS}
import repro.exp.tables.RegressionTables

/** Bench for §6.3 linear regression (Fig 12).
  *
  * Paper numbers:
  *  (a) saturated n=1000, P(10,10): MSE 3.51 (R-TBS) / 4.02 (SW) / 4.43 (Unif);
  *      10% ES 6.04 / 10.94 / 10.05.
  *  (b) unsaturated n=1600, P(10,10): MSE 3.50 (R-TBS) / 4.17 (SW);
  *      ES 5.97 (R-TBS) / 5.86 (SW) — comparable; R-TBS stabilizes at 1479.
  *  (c) unsaturated n=1600, P(16,16): SW's window is too short again and its
  *      fluctuations return; R-TBS best overall.
  */
class RegressionBench extends AnyFunSuite {

  private lazy val results = RegressionTables.compute(runs = 30)

  test("regression: print measured tables") {
    println("=== Linear regression: MSE & 10% ES (30 runs) ===")
    println(RegressionTables.render(results))
    assert(results.size == 3)
  }

  private def scheme(i: Int, name: String): (Double, Double) = {
    val (_, m, e) = results(i).byScheme.find(_._1.startsWith(name)).get
    (m, e)
  }

  test("saturated: R-TBS has the best MSE and by far the best ES") {
    val (rtbsM, rtbsE) = scheme(0, "R-TBS")
    val (swM, swE) = scheme(0, "SW")
    val (unifM, unifE) = scheme(0, "Unif")
    assert(rtbsM < swM && rtbsM < unifM, s"MSE: rtbs=$rtbsM sw=$swM unif=$unifM")
    assert(swE > 1.4 * rtbsE, s"ES: sw=$swE rtbs=$rtbsE")
    assert(unifE > 1.4 * rtbsE, s"ES: unif=$unifE rtbs=$rtbsE")
  }

  test("unsaturated P(10,10): SW robustness becomes comparable but its MSE suffers") {
    val (rtbsM, rtbsE) = scheme(1, "R-TBS")
    val (swM, swE) = scheme(1, "SW")
    assert(swM > rtbsM, s"MSE: sw=$swM should exceed rtbs=$rtbsM")
    // "comparable": within 35% of each other rather than the >1.8x gap of (a).
    assert(swE < 1.35 * rtbsE, s"ES should be comparable: sw=$swE rtbs=$rtbsE")
  }

  test("unsaturated P(16,16): SW fluctuations return; R-TBS best overall") {
    val (rtbsM, rtbsE) = scheme(2, "R-TBS")
    val (swM, swE) = scheme(2, "SW")
    assert(rtbsM < swM, s"MSE: rtbs=$rtbsM sw=$swM")
    assert(swE > 1.4 * rtbsE, s"ES: sw=$swE rtbs=$rtbsE")
  }

  test("more data is not always better: unsaturated R-TBS (≈1479 items) beats full 1600-item SW") {
    val (rtbsM, _) = scheme(1, "R-TBS")
    val (swM, _) = scheme(1, "SW")
    assert(rtbsM < swM)
  }

  test("R-TBS reservoir stabilizes at 1479 of 1600 (the paper's headline number)") {
    val r = new RTBS[Unit](1600, 0.07, seed = 7)
    (1 to 300).foreach(t => r.processBatch((0 until 100).map(i => Item(t * 1000L + i, t, ()))))
    assert(math.abs(r.sampleWeight - 1479.0) < 1.5, s"C=${r.sampleWeight}")
    assert(r.sample.size == 1479 || r.sample.size == 1480)
  }
}
