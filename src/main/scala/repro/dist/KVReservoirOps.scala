package repro.dist

import org.apache.spark.HashPartitioner
import org.apache.spark.SparkContext
import org.apache.spark.rdd.RDD
import org.apache.spark.storage.StorageLevel
import repro.core.{Item, Rng}
import scala.reflect.ClassTag

/** Key-value-store reservoir (§5.2, Fig 5(a)): each item is a (slot → item)
  * pair, hash-partitioned by slot number — deliberately uncorrelated with the
  * incoming batch's partitioning, like an off-the-shelf store (the paper used
  * Memcached; we simulate it with a slot-keyed RDD so the experiment runs
  * offline, preserving the two costs the paper attributes to this design:
  * inserts cross the network to the slot's owner partition, and there is no
  * co-location with the batch).
  *
  * Decisions are centralized (the master generates victim and destination
  * slot numbers — §5.3 notes distributed decisions are impractical for KV).
  * The retrieval of insert items from the batch uses either
  *   - a standard repartition join ("RJ", both sides shuffled), or
  *   - the customized partitioner + co-located join ("CJ", Fig 6(a)),
  * selected by `coLocatedJoin`.
  *
  * Slots stay contiguous in [0, count): shrinking deletes compact by moving
  * surviving tail items into the holes, exactly the coordination burden §5.3
  * describes for KV reservoirs.
  */
final class KVReservoirOps[P: ClassTag](
    sc: SparkContext,
    val numPartitions: Int,
    coLocatedJoin: Boolean,
    seed: Long,
) extends ReservoirOps[P, RDD[Item[P]]] {

  private val hp = new HashPartitioner(numPartitions)
  private val rng = new Rng(seed)
  private var slotCount: Long = 0L

  private var reservoir: RDD[(Long, Item[P])] = {
    val r = sc.parallelize(Seq.empty[(Long, Item[P])], numPartitions).partitionBy(hp)
    r.persist(StorageLevel.MEMORY_ONLY); r.count(); r
  }

  private var pendingBatch: Option[(RDD[Item[P]], Array[Long])] = None

  override def count: Long = slotCount

  override def batchSize(b: RDD[Item[P]]): Long = {
    b.persist(StorageLevel.MEMORY_ONLY)
    val ps = b.mapPartitionsWithIndex((pid, it) => Iterator((pid, it.size.toLong))).collect()
    val arr = Array.fill(b.getNumPartitions)(0L)
    ps.foreach { case (pid, s) => arr(pid) = s }
    pendingBatch = Some((b, arr))
    arr.sum
  }

  private def swap(newRdd: RDD[(Long, Item[P])]): Unit = {
    val old = reservoir
    newRdd.persist(StorageLevel.MEMORY_ONLY)
    newRdd.count()
    old.unpersist(blocking = false)
    reservoir = newRdd
  }

  /** Delete the given slots and compact the tail into the holes so slots stay
    * contiguous — requires rekeying (and thus re-shuffling) the moved items.
    */
  private def deleteSlots(victims: Set[Long]): Unit = {
    val newCount = slotCount - victims.size
    val holes = victims.filter(_ < newCount).toArray.sorted
    val tailSurvivors = (newCount until slotCount).filterNot(victims.contains)
    val moves: Map[Long, Long] = tailSurvivors.zip(holes).toMap
    val bVictims = sc.broadcast(victims)
    val bMoves = sc.broadcast(moves)
    val kept = reservoir.filter { case (s, _) => !bVictims.value.contains(s) && !bMoves.value.contains(s) }
    val moved = reservoir
      .filter { case (s, _) => bMoves.value.contains(s) }
      .map { case (s, it) => (bMoves.value(s), it) }
      .partitionBy(hp) // rekeyed items cross the network to their new owners
    swap(kept.union(moved))
    slotCount = newCount
  }

  override def deleteRandom(k: Long): Unit = {
    if (k <= 0) return
    val kk = math.min(k, slotCount).toInt
    deleteSlots(rng.sampleIndices(slotCount.toInt, kk).map(_.toLong).toSet)
  }

  override def extractRandomOne(): Item[P] = {
    require(slotCount > 0, "extract from empty reservoir")
    val slot = rng.nextInt(slotCount.toInt).toLong
    val item = reservoir.lookup(slot).head
    deleteSlots(Set(slot))
    item
  }

  override def insertOne(item: Item[P]): Unit = {
    val put = sc.parallelize(Seq((slotCount, item)), 1).partitionBy(hp)
    swap(reservoir.union(put))
    slotCount += 1
  }

  override def appendAll(b: RDD[Item[P]]): Unit = {
    val (batch, bSizes) = pending(b)
    val offsets = bSizes.scanLeft(slotCount)(_ + _)
    val bOffsets = sc.broadcast(offsets)
    // Every inserted item is written across the network to its slot's owner
    // partition — the fundamental KV-store cost (Fig 5(a)).
    val puts = batch
      .mapPartitionsWithIndex { (pid, it) =>
        val base = bOffsets.value(pid)
        it.zipWithIndex.map { case (item, i) => (base + i, item) }
      }
      .partitionBy(hp)
    swap(reservoir.union(puts))
    slotCount += bSizes.sum
    done(b)
  }

  override def replaceRandom(m: Long, b: RDD[Item[P]]): Unit = {
    val (batch, bSizes) = pending(b)
    val mm = math.min(m, math.min(slotCount, bSizes.sum)).toInt
    // Master generates victim slots in the reservoir and positions in the batch.
    val victims = rng.sampleIndices(slotCount.toInt, mm).map(_.toLong)
    val positions = rng.sampleIndices(bSizes.sum.toInt, mm).map(_.toLong)
    val retrieved: RDD[(Long, Item[P])] = // (destination slot -> batch item)
      if (coLocatedJoin) retrieveCoLocated(batch, bSizes, positions.zip(victims))
      else retrieveRepartitionJoin(batch, positions.zip(victims))
    val bVictims = sc.broadcast(victims.toSet)
    val kept = reservoir.filter { case (s, _) => !bVictims.value.contains(s) }
    swap(kept.union(retrieved.partitionBy(hp)))
    done(b)
  }

  /** Standard repartition join ("RJ"): both the indexed batch and the request
    * set Q are shuffled by global position.
    */
  private def retrieveRepartitionJoin(batch: RDD[Item[P]],
                                      posToSlot: IndexedSeq[(Long, Long)]): RDD[(Long, Item[P])] = {
    val indexed = batch.zipWithIndex().map { case (item, i) => (i, item) }
    val q = sc.parallelize(posToSlot, numPartitions)
    indexed.join(q).map { case (_, (item, destSlot)) => (destSlot, item) }
  }

  /** Customized partitioner + co-located join ("CJ", Fig 6(a)): the request
    * set Q is partitioned identically to the batch, so the retrieval itself
    * incurs no shuffle; only the subsequent write to the reservoir does.
    */
  private def retrieveCoLocated(batch: RDD[Item[P]], bSizes: Array[Long],
                                posToSlot: IndexedSeq[(Long, Long)]): RDD[(Long, Item[P])] = {
    val cum = bSizes.scanLeft(0L)(_ + _)
    val perPid: IndexedSeq[Array[(Int, Long)]] = bSizes.indices.map { pid =>
      posToSlot
        .filter { case (pos, _) => pos >= cum(pid) && pos < cum(pid + 1) }
        .map { case (pos, slot) => ((pos - cum(pid)).toInt, slot) }
        .toArray
    }
    val q = sc.parallelize(perPid, bSizes.length) // co-partitioned with the batch
    batch.zipPartitions(q) { (bit, qit) =>
      val wanted = qit.next().toMap
      bit.zipWithIndex.collect { case (item, i) if wanted.contains(i) => (wanted(i), item) }
    }
  }

  private def pending(b: RDD[Item[P]]): (RDD[Item[P]], Array[Long]) =
    pendingBatch match {
      case Some((rdd, ps)) if rdd eq b => (rdd, ps)
      case _ => throw new IllegalStateException("call batchSize(b) before consuming a batch")
    }

  private def done(b: RDD[Item[P]]): Unit = {
    b.unpersist(blocking = false)
    pendingBatch = None
  }

  override def items: IndexedSeq[Item[P]] = reservoir.values.collect().toVector
}
