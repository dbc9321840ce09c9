package repro

import org.apache.spark.sql.functions._
import repro.core.{Item, RTBS}

/** Integration tests: time-biased sampling over a TPC-H-lite `lineitem`
  * stream, with every DataFrame query over the maintained sample checked for
  * result equality against DuckDB via the oracle.
  */
class OracleSamplingSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001, seed = 1).cache()

  test("oracle sanity: plain aggregate over lineitem matches DuckDB") {
    val agg = li
      .groupBy("l_returnflag")
      .agg(count("*").as("cnt"), round(sum("l_quantity"), 2).as("qty"))
      .select("l_returnflag", "cnt", "qty")
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag, count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("R-TBS sample of a batched lineitem stream: Spark SQL over the sample matches DuckDB") {
    import spark.implicits._
    // Stream lineitem in arrival order as 10 batches (discretized time, §2).
    val rows = li.select("l_orderkey", "l_quantity", "l_returnflag").collect().toVector
    val batchSizeN = rows.size / 10
    val sampler = new RTBS[(Long, Double, String)](200, 0.3, seed = 5)
    rows.grouped(batchSizeN).zipWithIndex.foreach { case (chunk, t) =>
      sampler.processBatch(chunk.zipWithIndex.map { case (r, i) =>
        Item(t.toLong * 1000000 + i, t + 1,
          (r.getLong(0), r.getDouble(1), r.getString(2)))
      }.toVector)
    }
    val sample = sampler.sample
    assert(sample.size <= 200)
    val sampleDf = sample
      .map(it => (it.batch, it.payload._1, it.payload._2, it.payload._3))
      .toDF("batch", "l_orderkey", "l_quantity", "l_returnflag")
      .cache()
    // Query 1: per-batch composition of the sample.
    val q1 = sampleDf.groupBy("batch").agg(count("*").as("cnt")).select("batch", "cnt")
    Oracle.assertEquivalent(q1,
      "SELECT batch, count(*) AS cnt FROM s GROUP BY batch", "s" -> sampleDf)
    // Query 2: an analytics-style aggregate a retrained model would consume.
    val q2 = sampleDf
      .groupBy("l_returnflag")
      .agg(round(avg("l_quantity"), 4).as("avg_qty"), count("*").as("cnt"))
      .select("l_returnflag", "avg_qty", "cnt")
    Oracle.assertEquivalent(q2,
      "SELECT l_returnflag, round(avg(CAST(l_quantity AS DOUBLE)), 4) AS avg_qty, " +
        "count(*) AS cnt FROM s GROUP BY l_returnflag",
      "s" -> sampleDf)
    // The time bias must show: later batches dominate earlier ones.
    val byBatch = sample.groupBy(_.batch).view.mapValues(_.size).toMap
    assert(byBatch.getOrElse(10, 0) > byBatch.getOrElse(1, 0),
      s"latest batch should outnumber the first: $byBatch")
  }

  test("uniform-key skew generator: sampled stream aggregates match DuckDB") {
    val keys = SynthData.uniformKeys(spark, rows = 2000, nKeys = 10, seed = 3)
    val agg = keys.groupBy("k").agg(count("*").as("cnt"), round(sum("v"), 3).as("sv"))
      .select("k", "cnt", "sv")
    Oracle.assertEquivalent(agg,
      "SELECT k, count(*) AS cnt, round(sum(CAST(v AS DOUBLE)), 3) AS sv FROM t GROUP BY k",
      "t" -> keys)
  }
}
