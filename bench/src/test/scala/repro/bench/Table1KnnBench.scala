package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.tables.Table1Knn

/** Bench for Table 1: kNN accuracy (Miss%) and robustness (10% ES) across
  * temporal patterns, 30 runs, n=1000, b=100, k=7, λ ∈ {0.05, 0.07, 0.1}.
  *
  * Paper's qualitative claims (the cell values we can read from the text):
  *  - Unif is always worst on accuracy "by a large margin" (Single-Event
  *    row legible: Miss 25.6, ES 19.3);
  *  - R-TBS and SW have similar accuracy, R-TBS with a slight edge mostly;
  *  - SW is almost always worst on robustness, with ES 1.4x–2.7x the max ES
  *    of R-TBS across λ; Unif ES 1.4x–1.7x that of R-TBS (except Single
  *    Event, where Unif is fine because the data returns to normal).
  */
class Table1KnnBench extends AnyFunSuite {

  private lazy val rows = Table1Knn.compute(runs = 30)

  test("Table 1: print measured table (paper values in EXPERIMENTS.md)") {
    println("=== Table 1: kNN accuracy & robustness (30 runs) ===")
    println(Table1Knn.render(rows))
    assert(rows.nonEmpty)
  }

  private def cell(scheme: String, patternIdx: Int): (Double, Double) =
    rows.find(_.scheme.startsWith(scheme)).get.cells(patternIdx)

  test("Unif has the worst accuracy on every pattern") {
    Table1Knn.patterns.indices.foreach { i =>
      val unifMiss = cell("Unif", i)._1
      val others = rows.filterNot(_.scheme == "Unif").map(_.cells(i)._1)
      assert(unifMiss > others.max,
        s"pattern $i: Unif=$unifMiss should exceed all of $others")
    }
  }

  test("SW is the least robust on periodic patterns (ES well above R-TBS)") {
    // Patterns 1..3 are periodic; paper: SW ES is 1.4x-2.7x max R-TBS ES.
    (1 to 3).foreach { i =>
      val swEs = cell("SW", i)._2
      val rtbsMaxEs = rows.filter(_.scheme.startsWith("R-TBS")).map(_.cells(i)._2).max
      assert(swEs > 1.3 * rtbsMaxEs,
        s"pattern $i: SW ES $swEs should be >1.3x max R-TBS ES $rtbsMaxEs")
    }
  }

  test("Unif is less robust than R-TBS on periodic patterns") {
    (1 to 3).foreach { i =>
      val unifEs = cell("Unif", i)._2
      val rtbsMaxEs = rows.filter(_.scheme.startsWith("R-TBS")).map(_.cells(i)._2).max
      assert(unifEs > 1.2 * rtbsMaxEs,
        s"pattern $i: Unif ES $unifEs vs max R-TBS ES $rtbsMaxEs")
    }
  }

  test("R-TBS accuracy is competitive with SW (within 10%) on periodic patterns") {
    (1 to 3).foreach { i =>
      val swMiss = cell("SW", i)._1
      val rtbsBest = rows.filter(_.scheme.startsWith("R-TBS")).map(_.cells(i)._1).min
      assert(rtbsBest < swMiss * 1.1,
        s"pattern $i: best R-TBS $rtbsBest should be within 10% of SW $swMiss")
    }
  }

  test("robustness holds over the whole lambda range (no precise tuning needed)") {
    // Every R-TBS row individually beats SW on ES for periodic patterns.
    (1 to 3).foreach { i =>
      val swEs = cell("SW", i)._2
      rows.filter(_.scheme.startsWith("R-TBS")).foreach { r =>
        assert(r.cells(i)._2 < swEs, s"pattern $i: ${r.scheme} ES ${r.cells(i)._2} vs SW $swEs")
      }
    }
  }
}
