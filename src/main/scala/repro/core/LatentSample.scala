package repro.core

import scala.collection.mutable.ArrayBuffer

/** A latent "fractional" sample L = (A, π, C) (paper §4.1).
  *
  * `A` holds ⌊C⌋ full items, `π` at most one partial item, and the sample
  * weight `C` is real-valued. The realized sample S includes every full item
  * and the partial item with probability frac(C) (eq. (2)), so E[|S|] = C.
  *
  * Mutability is deliberate: R-TBS updates the sample in place every batch;
  * the structure is confined to a single sampler instance and never shared.
  *
  * Class invariants (checked in tests):
  *   - |A| = ⌊C⌋ (after epsilon-snapping of C),
  *   - π is nonempty iff frac(C) > 0 (when C > 0),
  *   - footprint |A| + |π| ≤ ⌊C⌋ + 1.
  */
final class LatentSample[P](rng: Rng) {
  import LatentSample._

  private val full = ArrayBuffer.empty[Item[P]]
  private var partial: Option[Item[P]] = None
  private var weight: Double = 0.0

  /** Current sample weight C. */
  def C: Double = weight

  /** The ⌊C⌋ full items (read-only copy). */
  def fullItems: IndexedSeq[Item[P]] = full.toVector

  /** The partial item, if frac(C) > 0. */
  def partialItem: Option[Item[P]] = partial

  /** Physical storage size |A| + |π|. */
  def footprint: Int = full.size + (if (partial.isDefined) 1 else 0)

  /** Realize S from L per eq. (2): full items surely, partial item w.p. frac(C). */
  def realize(): IndexedSeq[Item[P]] = partial match {
    case Some(p) if rng.uniform() < frac(snap(weight)) => (full :+ p).toVector
    case _ => full.toVector
  }

  /** Reset to the empty sample. */
  def clear(): Unit = { full.clear(); partial = None; weight = 0.0 }

  /** Append `items` as full items; C increases by `items.size`. Used when all
    * arriving batch items are accepted with probability 1 (R-TBS lines 9/20).
    */
  def appendFull(items: IterableOnce[Item[P]]): Unit = {
    var added = 0
    items.iterator.foreach { it => full += it; added += 1 }
    weight = snap(weight + added)
  }

  /** Remove and return min(m, |A|) uniformly random full items; C decreases
    * accordingly. Used for the saturated-case replacement (R-TBS line 17).
    */
  def removeRandomFull(m: Int): IndexedSeq[Item[P]] = {
    val k = math.min(m, full.size)
    if (k <= 0) return Vector.empty
    val idx = rng.sampleIndices(full.size, k).sorted(Ordering.Int.reverse)
    val removed = ArrayBuffer.empty[Item[P]]
    idx.foreach { i => removed += full(i); full.remove(i) }
    weight = snap(weight - k)
    removed.toVector
  }

  /** Algorithm 3: downsample to target weight `cPrime` (0 ≤ cPrime ≤ C),
    * scaling every item's inclusion probability by exactly cPrime/C
    * (Theorem 4.1). cPrime = C is a no-op; cPrime = 0 empties the sample.
    */
  def downsampleTo(cPrime: Double): Unit = {
    val cOld = snap(weight)
    val cNew = snap(cPrime)
    require(cNew >= 0 && cNew <= cOld + Eps, s"downsample target $cNew outside [0, $cOld]")
    if (cNew <= 0) { clear(); return }
    if (cNew >= cOld) { weight = cNew; return }

    val flOld = math.floor(cOld); val frOld = cOld - flOld
    val flNew = math.floor(cNew); val frNew = cNew - flNew
    val u = rng.uniform()

    if (flNew == 0) {
      // No full items retained: the output is a lone partial item.
      if (partial.isEmpty || u > frOld / cOld) {
        // SWAP1 then eject: a uniformly random ex-full item becomes partial.
        partial = Some(full(rng.nextInt(full.size)))
      } // else the current partial item survives as the partial.
      full.clear()
    } else if (flNew == flOld) {
      // No full items deleted; the partial may be promoted via SWAP1.
      val noSwap = (1.0 - (cNew / cOld) * frOld) / (1.0 - frNew)
      if (u > noSwap) {
        val i = rng.nextInt(full.size)
        val promotedToPartial = full(i)
        partial match {
          case Some(p) => full(i) = p // old partial becomes full
          case None    => full.remove(i) // degenerate; cannot occur when frOld > 0
        }
        partial = Some(promotedToPartial)
      }
    } else {
      // 0 < ⌊C'⌋ < ⌊C⌋: some full items are deleted.
      if (u <= (cNew / cOld) * frOld) {
        // Partial item is promoted to full: keep ⌊C'⌋ random full items, then
        // SWAP1 — one of them becomes the new partial, old partial goes full.
        retainRandomFull(flNew.toInt)
        val i = rng.nextInt(full.size)
        val promotedToPartial = full(i)
        partial match {
          case Some(p) => full(i) = p
          case None    => full.remove(i)
        }
        partial = Some(promotedToPartial)
      } else {
        // Partial item is ejected: keep ⌊C'⌋+1 random full items, then MOVE1
        // — one of them becomes the new partial.
        retainRandomFull(flNew.toInt + 1)
        val i = rng.nextInt(full.size)
        partial = Some(full(i))
        full.remove(i)
      }
    }
    if (frNew < Eps) partial = None // line 19: no fractional item
    weight = cNew
  }

  /** Keep `k` uniformly random full items, discard the rest (in place). */
  private def retainRandomFull(k: Int): Unit = {
    val kept = rng.sampleWithoutReplacement(full.toVector, k)
    full.clear(); full ++= kept
  }
}

object LatentSample {
  /** Tolerance for treating an accumulated floating-point weight as integral. */
  val Eps: Double = 1e-9

  /** Snap x to the nearest integer when within Eps — keeps ⌊C⌋/frac(C)
    * decisions immune to floating-point drift from repeated e^{-λ} scaling.
    */
  def snap(x: Double): Double = {
    val r = math.rint(x)
    if (math.abs(x - r) < Eps) r else x
  }

  /** frac(x) = x − ⌊x⌋ on a snapped value. */
  def frac(x: Double): Double = x - math.floor(x)
}
