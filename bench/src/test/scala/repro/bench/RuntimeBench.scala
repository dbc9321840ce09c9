package repro.bench

import repro.SparkSpec
import repro.exp.tables.RuntimeTable

/** Bench for Figure 7: mean per-batch runtime of the five distributed TBS
  * implementations (scaled down: batch 100k / reservoir 200k instead of the
  * paper's 10M / 20M on 12 workers — see DESIGN.md substitutions).
  *
  * Paper's ordering (absolute seconds do not transfer to one laptop-scale
  * node, the ordering and rough factors do):
  *   Cent-KV-RJ > Cent-KV-CJ (CJ halves retrieval network cost)
  *   Cent-KV-CJ > Cent-CP (co-partitioning: >2.6x)
  *   Cent-CP  > Dist-CP (distributed decisions: 1.6x)
  *   D-T-TBS fastest (embarrassingly parallel).
  */
class RuntimeBench extends SparkSpec {

  private lazy val timings = RuntimeTable.compute(spark, batchSize = 300000, rounds = 8, warm = 3)

  private def mean(name: String): Double = timings.find(_.impl.contains(name)).get.meanMs

  test("figure 7: print measured per-batch runtimes") {
    println("=== Figure 7: per-batch runtime, batch=300k, reservoir=600k, local[*] ===")
    println(RuntimeTable.render(timings))
    assert(timings.size == 5)
  }

  test("co-partitioned reservoir beats the KV-store reservoir") {
    val bestKv = math.min(mean("KV-RJ"), mean("KV-CJ"))
    val bestCp = math.min(mean("Cent-CP"), mean("Dist-CP"))
    assert(bestCp < 0.75 * bestKv,
      s"CP ($bestCp ms) should be well below KV ($bestKv ms)")
  }

  test("co-located join does not lose to the repartition join") {
    assert(mean("KV-CJ") <= 1.15 * mean("KV-RJ"),
      s"CJ ${mean("KV-CJ")} vs RJ ${mean("KV-RJ")}")
  }

  test("distributed decisions do not lose to centralized ones") {
    assert(mean("Dist-CP") <= 1.15 * mean("Cent-CP"),
      s"Dist ${mean("Dist-CP")} vs Cent ${mean("Cent-CP")}")
  }

  test("D-T-TBS is the fastest implementation") {
    val tbs = mean("D-T-TBS")
    timings.filter(_.impl.startsWith("D-R-TBS")).foreach { t =>
      assert(tbs < t.meanMs, s"D-T-TBS $tbs ms vs ${t.impl} ${t.meanMs} ms")
    }
  }
}
