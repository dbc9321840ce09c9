package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.tables.VaryingBatchKnn

/** Bench for §6.2 "Varying batch size" (Fig 11): kNN with λ=0.07 under
  * Uniform(0,200) and 2%-growing batch sizes, P(10,10).
  *
  * Paper ratios vs R-TBS (uniform / growing):
  *   SW Miss 1.16x / 1.14x, Unif Miss 1.47x / 1.40x,
  *   SW ES 1.82x / 1.98x,  Unif ES 1.76x / 1.78x.
  */
class VaryingBatchKnnBench extends AnyFunSuite {

  private lazy val results = VaryingBatchKnn.compute(runs = 30)

  test("varying batch sizes: print measured tables") {
    println("=== Varying batch size: kNN lambda=0.07, P(10,10), 30 runs ===")
    println(VaryingBatchKnn.render(results))
    assert(results.size == 2)
  }

  test("R-TBS keeps its accuracy and robustness edge under varying arrival rates") {
    results.foreach { rr =>
      val Seq((_, rtbsMiss, rtbsEs), (_, swMiss, swEs), (_, unifMiss, unifEs)) = rr.byScheme
      assert(swMiss > rtbsMiss, s"${rr.regime}: SW miss $swMiss vs R-TBS $rtbsMiss")
      assert(unifMiss > 1.2 * rtbsMiss, s"${rr.regime}: Unif miss $unifMiss vs R-TBS $rtbsMiss")
      assert(swEs > 1.3 * rtbsEs, s"${rr.regime}: SW ES $swEs vs R-TBS $rtbsEs")
      assert(unifEs > 1.3 * rtbsEs, s"${rr.regime}: Unif ES $unifEs vs R-TBS $rtbsEs")
    }
  }
}
