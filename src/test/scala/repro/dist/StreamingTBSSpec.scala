package repro.dist

import repro.SparkSpec
import repro.dist.StreamingTBS.Event

/** End-to-end Structured Streaming test: MemoryStream micro-batches feed the
  * stateful D-R-TBS transformation via foreachBatch; the maintained sample is
  * exported as a DataFrame and checked against the DuckDB oracle.
  */
class StreamingTBSSpec extends SparkSpec {

  private def mkBatches(sizes: Seq[Int]): Seq[Seq[Event]] =
    sizes.zipWithIndex.map { case (b, i) =>
      (0 until b).map(j => Event(i.toLong * 100000 + j, i + 1, j.toDouble, (j % 7).toDouble))
    }

  test("streamed R-TBS keeps the bound and the exact weight recurrence") {
    val sizes = Seq(30, 0, 45, 10, 60)
    val n = 50; val lambda = 0.1
    val (sampleDf, trajectory) = StreamingTBS.runRTBS(
      spark, mkBatches(sizes), n, lambda, numPartitions = 4, seed = 7)
    // Every recorded step must satisfy W_i = e^-lambda * W_{i-1} + B_i for the
    // batch sizes we actually fed (MemoryStream may or may not add an empty
    // bootstrap batch; recover the sizes from the recurrence and compare).
    var w = 0.0
    val recovered = trajectory.map { case (wi, _) =>
      val b = math.round(wi - w * math.exp(-lambda))
      w = wi
      b
    }
    assert(recovered.filter(_ > 0) == sizes.filter(_ > 0).map(_.toLong),
      s"recovered batch sizes $recovered from trajectory do not match $sizes")
    trajectory.foreach { case (wi, ci) =>
      assert(math.abs(ci - math.min(n.toDouble, wi)) < 1e-9)
    }
    assert(sampleDf.count() <= n)
  }

  test("exported sample DataFrame agrees with DuckDB on per-batch aggregates") {
    val sizes = Seq(25, 25, 25)
    val (sampleDf, _) = StreamingTBS.runRTBS(
      spark, mkBatches(sizes), n = 40, lambda = 0.2, numPartitions = 4, seed = 9)
    val agg = sampleDf
      .groupBy("batch")
      .agg(
        org.apache.spark.sql.functions.count("*").as("cnt"),
        org.apache.spark.sql.functions.round(org.apache.spark.sql.functions.sum("x"), 3).as("sx"))
      .select("batch", "cnt", "sx")
    repro.Oracle.assertEquivalent(
      agg,
      "SELECT batch, count(*) AS cnt, round(sum(CAST(x AS DOUBLE)), 3) AS sx FROM s GROUP BY batch",
      "s" -> sampleDf)
  }

  test("centralized decisions work under streaming too") {
    val (sampleDf, trajectory) = StreamingTBS.runRTBS(
      spark, mkBatches(Seq(20, 20)), n = 15, lambda = 0.1, numPartitions = 4, seed = 11,
      distributedDecisions = false)
    assert(sampleDf.count() <= 15)
    assert(trajectory.nonEmpty)
  }
}
