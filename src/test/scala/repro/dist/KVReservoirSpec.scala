package repro.dist

import org.apache.spark.rdd.RDD
import repro.SparkSpec
import repro.core.{Item, Rng, RTBS}

/** Spark tests for D-R-TBS over the simulated key-value-store reservoir, with
  * both repartition-join and co-located-join retrieval (§5.2–5.3).
  */
class KVReservoirSpec extends SparkSpec {

  private val parts = 4

  private def mkBatchRdd(t: Int, size: Int): RDD[Item[Int]] =
    spark.sparkContext.parallelize(
      (0 until size).map(i => Item(t.toLong * 1000000 + i, t, i)), parts)

  for (cj <- Seq(false, true)) {
    val mode = if (cj) "co-located join (CJ)" else "repartition join (RJ)"

    test(s"[$mode] weight trajectory equals single-node R-TBS") {
      val lambda = 0.15; val n = 40
      val sizes = Seq(15, 35, 0, 50, 5)
      val ops = new KVReservoirOps[Int](spark.sparkContext, parts, cj, 31)
      val d = new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(1))
      val r = new RTBS[Int](n, lambda, 2)
      sizes.zipWithIndex.foreach { case (b, i) =>
        d.processBatch(mkBatchRdd(i + 1, b))
        r.processBatch((0 until b).map(j => Item(j.toLong, i + 1, j)))
        assert(math.abs(d.totalWeight - r.totalWeight) < 1e-9)
        assert(math.abs(d.sampleWeight - r.sampleWeight) < 1e-9)
        assert(d.sample.size <= n)
        assert(ops.items.size.toLong == ops.count, "slot ledger out of sync")
      }
    }

    test(s"[$mode] replaceRandom keeps count and mixes in the new batch") {
      val ops = new KVReservoirOps[Int](spark.sparkContext, parts, cj, 37)
      val b1 = mkBatchRdd(1, 60)
      ops.batchSize(b1); ops.appendAll(b1)
      assert(ops.count == 60)
      val b2 = mkBatchRdd(2, 40)
      ops.batchSize(b2)
      ops.replaceRandom(20, b2)
      assert(ops.count == 60)
      val byBatch = ops.items.groupBy(_.batch).view.mapValues(_.size).toMap
      assert(byBatch(2) == 20 && byBatch(1) == 40)
      assert(ops.items.map(_.id).distinct.size == 60, "no duplicate items after replace")
    }
  }

  test("delete with compaction keeps slots contiguous (extract still works)") {
    val ops = new KVReservoirOps[Int](spark.sparkContext, parts, coLocatedJoin = true, 41)
    val b = mkBatchRdd(1, 50)
    ops.batchSize(b); ops.appendAll(b)
    ops.deleteRandom(23)
    assert(ops.count == 27)
    assert(ops.items.size == 27)
    // After compaction every slot in [0, 27) must be occupied; extracting all
    // of them one by one would fail if any slot were a hole.
    (1 to 27).foreach { i =>
      ops.extractRandomOne()
      assert(ops.count == 27 - i)
    }
    assert(ops.items.isEmpty)
  }

  test("insertOne appends at the next slot") {
    val ops = new KVReservoirOps[Int](spark.sparkContext, parts, coLocatedJoin = true, 43)
    ops.insertOne(Item(7L, 1, 7))
    ops.insertOne(Item(8L, 1, 8))
    assert(ops.count == 2)
    assert(ops.items.map(_.id).toSet == Set(7L, 8L))
  }

  test("RJ and CJ retrieval produce statistically identical sample composition") {
    // Same workload, both modes; the newest-batch share should agree.
    def run(cj: Boolean, seed: Long): Double = {
      val ops = new KVReservoirOps[Int](spark.sparkContext, parts, cj, seed)
      val d = new DRTBS[Int, RDD[Item[Int]]](30, 0.1, ops, new Rng(seed * 3 + 1))
      (1 to 8).foreach(t => d.processBatch(mkBatchRdd(t, 25)))
      d.sample.count(_.batch == 8).toDouble / d.sample.size
    }
    val rj = (1 to 10).map(i => run(cj = false, 100 + i)).sum / 10
    val cjv = (1 to 10).map(i => run(cj = true, 200 + i)).sum / 10
    assert(math.abs(rj - cjv) < 0.12, s"RJ=$rj CJ=$cjv should agree statistically")
  }
}
