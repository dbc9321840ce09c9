package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.tables.SampleSizeTable

/** Bench for Figure 1: sample-size behaviour of T-TBS vs R-TBS under the four
  * batch regimes (n = 1000). Paper claims:
  *  (a) growing batches overflow T-TBS while R-TBS holds n;
  *  (b) constant batches: R-TBS is exactly constant, T-TBS fluctuates;
  *  (c) Uniform[0,200]: T-TBS fluctuates widely (and can exceed n),
  *      R-TBS never exceeds n;
  *  (d) shrinking batches starve both, but R-TBS degrades more gracefully.
  */
class SampleSizeBench extends AnyFunSuite {

  private lazy val stats = SampleSizeTable.compute(horizon = 600)

  private def get(regimePrefix: String, scheme: String) =
    stats.find(s => s.regime.startsWith(regimePrefix) && s.scheme == scheme).get

  test("figure 1: print measured table") {
    println("=== Figure 1: sample size behaviour, T-TBS vs R-TBS (n=1000) ===")
    println(SampleSizeTable.render(stats))
    assert(stats.size == 8)
  }

  test("(a) growth: T-TBS overflows, R-TBS stays pinned at n") {
    val t = get("(a)", "T-TBS"); val r = get("(a)", "R-TBS")
    assert(t.finalSize > 1500, s"T-TBS final ${t.finalSize} should overflow n=1000")
    assert(r.maxSize <= 1000, s"R-TBS max ${r.maxSize} must never exceed n")
    assert(r.finalSize == 1000)
  }

  test("(b) constant: R-TBS exactly constant at n, T-TBS fluctuates") {
    val t = get("(b)", "T-TBS"); val r = get("(b)", "R-TBS")
    assert(r.sd == 0.0, s"R-TBS sd ${r.sd} should be exactly 0 once saturated")
    assert(r.meanPre == 1000.0)
    assert(t.sd > 3.0, s"T-TBS sd ${t.sd} should show binomial fluctuation")
  }

  test("(c) uniform batches: R-TBS bounded by n, T-TBS swings beyond it") {
    val t = get("(c)", "T-TBS"); val r = get("(c)", "R-TBS")
    assert(r.maxSize <= 1000)
    assert(t.sd > r.sd + 10, s"T-TBS sd ${t.sd} should far exceed R-TBS sd ${r.sd}")
    assert(t.maxSize > 1000, s"T-TBS max ${t.maxSize} should overshoot n at some point")
  }

  test("(d) decay: both shrink, R-TBS retains more of the sample") {
    val t = get("(d)", "T-TBS"); val r = get("(d)", "R-TBS")
    assert(t.finalSize < t.meanPre / 2, "T-TBS must shrink under starvation")
    assert(r.finalSize < r.meanPre / 2, "R-TBS must shrink under starvation (by design)")
    assert(r.finalSize > t.finalSize,
      s"R-TBS (${r.finalSize}) should degrade more gracefully than T-TBS (${t.finalSize})")
  }
}
