package repro.bench

import repro.SparkSpec
import repro.exp.tables.ScaleTable

/** Bench for Figures 8/9: scalability of the best D-R-TBS implementation
  * (Dist-CP). Fig 9 (scale-up): runtime roughly flat for small batches, then
  * rising once data volume dominates coordination. Fig 8 (scale-out): the
  * paper adds workers; we scale partitions on local[*] as a proxy
  * (substitution documented in DESIGN.md) — more parallelism helps up to a
  * point, then coordination overhead flattens the curve.
  */
class ScaleBench extends SparkSpec {

  test("figure 9: scale-up — runtime vs batch size") {
    val pts = ScaleTable.scaleUp(spark)
    println(ScaleTable.render("=== Figure 9: scale-up (Dist-CP, parts=8) ===", pts))
    val byName = pts.map(p => p.x -> p.meanMs).toMap
    val small = byName("batch=10000"); val mid = byName("batch=100000")
    val large = byName("batch=1000000")
    assert(large > mid, s"1M ($large ms) should cost more than 100k ($mid ms)")
    // Sub-linear below the knee: 10x data from 10k to 100k costs < 6x time.
    assert(mid < 6 * small, s"100k ($mid) vs 10k ($small): coordination should dominate early")
  }

  test("figure 8: scale-out proxy — runtime vs partition count") {
    val pts = ScaleTable.scaleOut(spark)
    println(ScaleTable.render("=== Figure 8: scale-out proxy (Dist-CP, batch=300k) ===", pts))
    val byName = pts.map(p => p.x -> p.meanMs).toMap
    val serial = byName("parts=1")
    val bestParallel = Seq("parts=4", "parts=8", "parts=16").map(byName).min
    assert(bestParallel < serial, s"parallel best $bestParallel vs serial $serial")
    // Diminishing returns: 16 partitions should not be dramatically better than 8.
    assert(byName("parts=16") > 0.3 * byName("parts=8"),
      "speedup must flatten as coordination dominates")
  }
}
