package repro.exp.tables

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import org.apache.spark.storage.StorageLevel
import repro.core.{Item, Rng}
import repro.dist._
import repro.exp.Experiments

/** Figure 7 as a table: mean per-batch runtime of the five distributed TBS
  * implementations. The paper ran 12 workers with 10M-item batches against a
  * 20M reservoir; we run local[*] with a scaled-down batch (default 100k) and
  * the same 2:1 reservoir:batch ratio and λ=0.07, so the *ordering* and
  * rough factors are what transfers (see DESIGN.md substitutions):
  *
  *   Cent-KV-RJ ≳ Cent-KV-CJ  >  Cent-CP  >  Dist-CP  >  D-T-TBS
  * (paper: CJ halves the retrieval network cost; CP ≈2.6× over KV-CJ;
  *  Dist ≈1.6× over Cent; T-TBS fastest, being coordination-free.)
  */
object RuntimeTable {

  final case class Timing(impl: String, meanMs: Double, sdMs: Double, rounds: Int)

  /** Generate a batch RDD of `size` items across `parts` partitions without
    * materializing it on the driver; cached and counted so timing excludes
    * data generation (the paper's batches stream in from HDFS ahead of use).
    */
  def genBatch(spark: SparkSession, t: Int, size: Int, parts: Int): RDD[Item[Int]] = {
    val per = size / parts
    val extra = size % parts
    val rdd = spark.sparkContext
      .parallelize(0 until parts, parts)
      .flatMap { pid =>
        val n = per + (if (pid < extra) 1 else 0)
        val base = t.toLong * 100000000L + pid.toLong * 1000000L
        (0 until n).iterator.map(i => Item(base + i, t, i))
      }
    rdd.persist(StorageLevel.MEMORY_ONLY)
    rdd.count()
    rdd
  }

  /** Time one implementation over `warm + rounds` batches, reporting the mean
    * and standard deviation of the measured (post-warm-up) rounds.
    */
  private def time(name: String, step: RDD[Item[Int]] => Unit, batches: Seq[RDD[Item[Int]]],
                   warm: Int): Timing = {
    val times = batches.zipWithIndex.map { case (b, i) =>
      val t0 = System.nanoTime()
      step(b)
      (System.nanoTime() - t0) / 1e6
    }
    val measured = times.drop(warm)
    val mean = measured.sum / measured.size
    val sd = math.sqrt(measured.map(x => (x - mean) * (x - mean)).sum / measured.size)
    Timing(name, mean, sd, measured.size)
  }

  /** Run a few small untimed rounds through every implementation so the JVM
    * JIT-compiles all code paths before measurement; without this the first
    * implementations measured pay the compilation cost and the comparison is
    * biased by run order.
    */
  private def jitWarm(spark: SparkSession, parts: Int, lambda: Double, seed: Long): Unit = {
    val sc = spark.sparkContext
    val size = 20000; val n = 2 * size
    val impls: Seq[RDD[Item[Int]] => Unit] = Seq(
      { val ops = new KVReservoirOps[Int](sc, parts, coLocatedJoin = false, seed + 100)
        new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 101)).processBatch _ },
      { val ops = new KVReservoirOps[Int](sc, parts, coLocatedJoin = true, seed + 110)
        new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 111)).processBatch _ },
      { val ops = new CoPartReservoirOps[Int](sc, parts, distributedDecisions = false, seed + 120)
        new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 121)).processBatch _ },
      { val ops = new CoPartReservoirOps[Int](sc, parts, distributedDecisions = true, seed + 130)
        new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 131)).processBatch _ },
      new DTTBS[Int](sc, n, lambda, size, parts, seed + 140).processBatch _,
    )
    impls.zipWithIndex.foreach { case (step, i) =>
      (1 to 4).foreach { t =>
        val b = genBatch(spark, 900000 + i * 10 + t, size, parts)
        step(b)
        b.unpersist(false)
      }
    }
  }

  /** Run all five implementations on identical workloads. */
  def compute(spark: SparkSession, batchSize: Int = 300000, rounds: Int = 10,
              warm: Int = 3, parts: Int = 8, lambda: Double = 0.07,
              seed: Long = 1234): Seq[Timing] = {
    val n = 2 * batchSize // paper ratio: 20M reservoir / 10M batch
    val sc = spark.sparkContext
    val total = warm + rounds
    jitWarm(spark, parts, lambda, seed)

    def freshBatches(offset: Int): Seq[RDD[Item[Int]]] =
      (1 to total).map(t => genBatch(spark, offset * 1000 + t, batchSize, parts))

    val results = scala.collection.mutable.ArrayBuffer.empty[Timing]

    {
      val ops = new KVReservoirOps[Int](sc, parts, coLocatedJoin = false, seed)
      val d = new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 1))
      val bs = freshBatches(1)
      results += time("D-R-TBS Cent-KV-RJ", d.processBatch, bs, warm)
      bs.foreach(_.unpersist(false))
    }
    {
      val ops = new KVReservoirOps[Int](sc, parts, coLocatedJoin = true, seed + 10)
      val d = new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 11))
      val bs = freshBatches(2)
      results += time("D-R-TBS Cent-KV-CJ", d.processBatch, bs, warm)
      bs.foreach(_.unpersist(false))
    }
    {
      val ops = new CoPartReservoirOps[Int](sc, parts, distributedDecisions = false, seed + 20)
      val d = new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 21))
      val bs = freshBatches(3)
      results += time("D-R-TBS Cent-CP", d.processBatch, bs, warm)
      bs.foreach(_.unpersist(false))
    }
    {
      val ops = new CoPartReservoirOps[Int](sc, parts, distributedDecisions = true, seed + 30)
      val d = new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed + 31))
      val bs = freshBatches(4)
      results += time("D-R-TBS Dist-CP", d.processBatch, bs, warm)
      bs.foreach(_.unpersist(false))
    }
    {
      val d = new DTTBS[Int](sc, n, lambda, batchSize, parts, seed + 40)
      val bs = freshBatches(5)
      results += time("D-T-TBS Dist-CP", d.processBatch, bs, warm)
      bs.foreach(_.unpersist(false))
    }
    results.toSeq
  }

  def render(timings: Seq[Timing]): String =
    Experiments.formatTable(
      Seq("Implementation", "mean ms/batch", "sd ms", "rounds"),
      timings.map(t => Seq(t.impl, f"${t.meanMs}%.0f", f"${t.sdMs}%.0f", t.rounds.toString)))
}
