package repro.exp.tables

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import repro.core.{Item, Rng}
import repro.dist.{CoPartReservoirOps, DRTBS}
import repro.exp.Experiments

/** Figures 8 and 9 as tables, for the best implementation (Dist-CP D-R-TBS).
  *
  * Fig 9 (scale-up): per-batch runtime vs batch size at fixed parallelism —
  * roughly flat while coordination dominates, then rising once the data
  * volume dominates.
  *
  * Fig 8 (scale-out): the paper adds physical workers; a single node cannot,
  * so we scale the partition count at fixed batch size as a proxy for worker
  * count (documented substitution) — runtime improves with parallelism and
  * then flattens as coordination overhead becomes prominent.
  */
object ScaleTable {

  final case class Point(x: String, meanMs: Double)

  def scaleUp(spark: SparkSession, sizes: Seq[Int] = Seq(10000, 30000, 100000, 300000, 1000000),
              parts: Int = 8, rounds: Int = 5, warm: Int = 2, lambda: Double = 0.07,
              seed: Long = 55): Seq[Point] =
    sizes.map { bs =>
      Point(f"batch=$bs", run(spark, bs, parts, rounds, warm, lambda, seed))
    }

  def scaleOut(spark: SparkSession, partCounts: Seq[Int] = Seq(1, 2, 4, 8, 16),
               batchSize: Int = 300000, rounds: Int = 5, warm: Int = 2, lambda: Double = 0.07,
               seed: Long = 56): Seq[Point] =
    partCounts.map { p =>
      Point(f"parts=$p", run(spark, batchSize, p, rounds, warm, lambda, seed))
    }

  private def run(spark: SparkSession, batchSize: Int, parts: Int, rounds: Int,
                  warm: Int, lambda: Double, seed: Long): Double = {
    val n = 2 * batchSize
    val ops = new CoPartReservoirOps[Int](spark.sparkContext, parts, distributedDecisions = true, seed)
    val d = new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 1))
    val batches = (1 to warm + rounds).map(t => RuntimeTable.genBatch(spark, t, batchSize, parts))
    val times = batches.map { b =>
      val t0 = System.nanoTime()
      d.processBatch(b)
      (System.nanoTime() - t0) / 1e6
    }
    batches.foreach(_.unpersist(false))
    val measured = times.drop(warm)
    measured.sum / measured.size
  }

  def render(title: String, points: Seq[Point]): String =
    s"$title\n" + Experiments.formatTable(
      Seq("Config", "mean ms/batch"),
      points.map(p => Seq(p.x, f"${p.meanMs}%.0f")))
}
