package repro.dist

import org.apache.spark.rdd.RDD
import repro.SparkSpec
import repro.core.Item

/** Spark tests for the embarrassingly parallel D-T-TBS (§5.1). */
class DTTBSSpec extends SparkSpec {

  private val parts = 4

  private def mkBatchRdd(t: Int, size: Int): RDD[Item[Int]] =
    spark.sparkContext.parallelize(
      (0 until size).map(i => Item(t.toLong * 1000000 + i, t, i)), parts)

  test("sample size converges to the target n") {
    val n = 200; val lambda = 0.1; val b = 100
    val d = new DTTBS[Int](spark.sparkContext, n, lambda, b, parts, 1)
    (1 to 60).foreach(t => d.processBatch(mkBatchRdd(t, b)))
    val size = d.sampleSize
    assert(math.abs(size - n) < 60, s"size=$size expect ~$n")
  }

  test("parameter restriction enforced like T-TBS") {
    intercept[IllegalArgumentException](
      new DTTBS[Int](spark.sparkContext, 1000, 0.1, 10, parts, 2))
  }

  test("older batches decay geometrically in the sample") {
    val n = 300; val lambda = 0.2; val b = 200
    val d = new DTTBS[Int](spark.sparkContext, n, lambda, b, parts, 3)
    (1 to 12).foreach(t => d.processBatch(mkBatchRdd(t, b)))
    val byBatch = d.sample.groupBy(_.batch).view.mapValues(_.size.toDouble).toMap
    // Compare batch 12 vs batch 9: expect ratio e^{-3λ}; generous tolerance
    // for a single run.
    val ratio = byBatch.getOrElse(9, 0.0) / math.max(1.0, byBatch.getOrElse(12, 1.0))
    val expect = math.exp(-3 * lambda)
    assert(math.abs(ratio - expect) < 0.35, s"ratio=$ratio expect=$expect")
  }

  test("no coordination state: processing empty batches just decays") {
    val d = new DTTBS[Int](spark.sparkContext, 100, 0.3, 100, parts, 4)
    (1 to 5).foreach(t => d.processBatch(mkBatchRdd(t, 100)))
    val before = d.sampleSize
    (6 to 15).foreach(t => d.processBatch(mkBatchRdd(t, 0)))
    assert(d.sampleSize < before / 3, "sample must shrink under starvation")
  }

  test("overflows under growing batches — the T-TBS failure mode, distributed") {
    val n = 100; val lambda = 0.05
    val d = new DTTBS[Int](spark.sparkContext, n, lambda, 100, parts, 5)
    var size = 100.0
    var overflowed = false
    (1 to 60).foreach { t =>
      d.processBatch(mkBatchRdd(t, size.toInt))
      size *= 1.05
      if (d.sampleSize > 2L * n) overflowed = true
    }
    assert(overflowed, "D-T-TBS cannot bound its sample when batches grow")
  }
}
