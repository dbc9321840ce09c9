package repro.dist

import repro.core.{Item, LatentSample, Rng}

/** Distributed R-TBS driver (§5.1): the master-side port of Algorithm 2.
  *
  * All weight bookkeeping (W, C) and the single partial item live at the
  * driver; the ⌊C⌋ full items live in a [[ReservoirOps]] backend. The
  * downsampling logic mirrors Algorithm 3 exactly, expressed through the
  * backend's delete/extract/insert primitives, so the statistical guarantees
  * of R-TBS (Theorems 4.1–4.4) carry over — verified by equivalence tests
  * against the single-node implementation.
  *
  * @param n      maximum sample size
  * @param lambda decay rate λ
  * @param ops    reservoir backend
  * @param rng    driver RNG (workers derive sub-streams inside the backend)
  */
final class DRTBS[P, B](val n: Int, val lambda: Double, ops: ReservoirOps[P, B], rng: Rng) {
  require(n > 0 && lambda >= 0, "bad parameters")
  import LatentSample.{frac, snap, Eps}

  private var totalW: Double = 0.0
  private var c: Double = 0.0
  private var partial: Option[Item[P]] = None

  /** Total decayed weight W_t. */
  def totalWeight: Double = totalW

  /** Sample weight C_t = min(n, W_t). */
  def sampleWeight: Double = c

  /** Ingest one batch (unit time step). */
  def processBatch(batch: B): Unit = {
    val bSize = ops.batchSize(batch)
    val d = math.exp(-lambda)
    if (totalW < n) {
      // Has been unsaturated: C = W.
      totalW = snap(totalW * d)
      if (totalW > 0 && c > 0) downsample(totalW)
      else if (totalW == 0) clearAll()
      ops.appendAll(batch)
      c = snap(c + bSize)
      totalW = snap(totalW + bSize)
      if (totalW > n) downsample(n) // overshoot: saturate
    } else {
      // Has been saturated: C = n, no partial item.
      totalW = snap(totalW * d + bSize)
      if (totalW >= n) {
        val m = rng.stochasticRound(bSize * n.toDouble / totalW)
        if (m > 0) ops.replaceRandom(m, batch)
      } else {
        downsample(totalW - bSize)
        ops.appendAll(batch)
        c = snap(c + bSize)
      }
    }
  }

  /** Realized sample S_t per eq. (2): full items plus the partial item with
    * probability frac(C).
    */
  def sample: IndexedSeq[Item[P]] = partial match {
    case Some(p) if rng.uniform() < frac(snap(c)) => ops.items :+ p
    case _ => ops.items
  }

  /** Full items plus the partial item unconditionally (diagnostics). */
  def latentItems: IndexedSeq[Item[P]] = ops.items ++ partial

  private def clearAll(): Unit = {
    if (ops.count > 0) ops.deleteRandom(ops.count)
    partial = None
    c = 0.0
  }

  /** Algorithm 3 against the distributed reservoir; same case analysis as
    * `LatentSample.downsampleTo`.
    */
  private def downsample(cPrime: Double): Unit = {
    val cOld = snap(c)
    val cNew = snap(cPrime)
    require(cNew >= 0 && cNew <= cOld + Eps, s"downsample target $cNew outside [0, $cOld]")
    if (cNew <= 0) { clearAll(); return }
    if (cNew >= cOld) { c = cNew; return }

    val flOld = math.floor(cOld); val frOld = cOld - flOld
    val flNew = math.floor(cNew); val frNew = cNew - flNew
    val u = rng.uniform()

    if (flNew == 0) {
      if (partial.isEmpty || u > frOld / cOld) {
        val p = ops.extractRandomOne()
        if (ops.count > 0) ops.deleteRandom(ops.count)
        partial = Some(p)
      } else {
        if (ops.count > 0) ops.deleteRandom(ops.count)
      }
    } else if (flNew == flOld) {
      val noSwap = (1.0 - (cNew / cOld) * frOld) / (1.0 - frNew)
      if (u > noSwap) {
        val promoted = ops.extractRandomOne()
        partial.foreach(ops.insertOne)
        partial = Some(promoted)
      }
    } else {
      if (u <= (cNew / cOld) * frOld) {
        ops.deleteRandom(ops.count - flNew.toLong)
        val promoted = ops.extractRandomOne()
        partial.foreach(ops.insertOne)
        partial = Some(promoted)
      } else {
        ops.deleteRandom(ops.count - (flNew.toLong + 1))
        val promoted = ops.extractRandomOne()
        partial = Some(promoted)
      }
    }
    if (frNew < Eps) partial = None
    c = cNew
  }
}
