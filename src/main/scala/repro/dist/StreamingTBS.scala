package repro.dist

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, Dataset, Row, SparkSession}
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.functions.col
import repro.core.{Item, Rng}

/** Structured Streaming integration (§5.2: "the incoming batch usually comes
  * from a distributed streaming system").
  *
  * The paper fed micro-batches from Spark Streaming; here the stream is a
  * Structured Streaming source and each micro-batch is handed to the D-R-TBS
  * driver via `foreachBatch` — the sampler is the stateful transformation,
  * maintaining per-partition reservoir state across micro-batches. The
  * maintained sample is exported as a DataFrame so downstream retraining (and
  * the DuckDB oracle in tests) can consume it with the Dataset API.
  */
object StreamingTBS {

  /** Generic streamed event: an id, the batch index it arrived in, and a
    * numeric payload vector flattened to two columns (enough for the kNN and
    * regression models; extend as needed).
    */
  final case class Event(id: Long, batch: Int, x: Double, y: Double)

  /** Convert a micro-batch DataFrame of [[Event]] rows into the co-partitioned
    * item RDD expected by the reservoir backends.
    */
  def toItemRdd(df: DataFrame, numPartitions: Int): RDD[Item[(Double, Double)]] = {
    import df.sparkSession.implicits._
    df.select(col("id"), col("batch"), col("x"), col("y"))
      .as[Event]
      .rdd
      .map(e => Item(e.id, e.batch, (e.x, e.y)))
      .repartition(numPartitions)
  }

  /** Export a maintained sample as a DataFrame for model retraining / SQL. */
  def sampleToDf(spark: SparkSession, sample: IndexedSeq[Item[(Double, Double)]]): DataFrame = {
    import spark.implicits._
    sample.map(i => Event(i.id, i.batch, i.payload._1, i.payload._2)).toDF()
  }

  /** Run a bounded Structured Streaming job: feed `batches` through a
    * MemoryStream, maintain a D-R-TBS sample inside `foreachBatch`, and
    * return the final sample as a DataFrame together with the driver's weight
    * trajectory (one (W, C) pair per processed micro-batch).
    */
  def runRTBS(spark: SparkSession, batches: Seq[Seq[Event]], n: Int, lambda: Double,
              numPartitions: Int, seed: Long,
              distributedDecisions: Boolean = true): (DataFrame, Seq[(Double, Double)]) = {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val ops = new CoPartReservoirOps[(Double, Double)](
      spark.sparkContext, numPartitions, distributedDecisions, seed)
    val drtbs = new DRTBS[(Double, Double), RDD[Item[(Double, Double)]]](
      n, lambda, ops, new Rng(seed ^ 0xABCDEF))
    val trajectory = scala.collection.mutable.ArrayBuffer.empty[(Double, Double)]

    val source = MemoryStream[Event]
    val query = source
      .toDS()
      .writeStream
      .outputMode("append")
      .foreachBatch { (df: Dataset[Event], _: Long) =>
        drtbs.processBatch(toItemRdd(df.toDF(), numPartitions))
        trajectory += ((drtbs.totalWeight, drtbs.sampleWeight))
        ()
      }
      .start()
    batches.foreach { batch =>
      source.addData(batch)
      query.processAllAvailable()
    }
    query.stop()
    (sampleToDf(spark, drtbs.sample), trajectory.toSeq)
  }
}
