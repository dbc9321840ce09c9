package repro.core

/** An item flowing through a batch-arrival stream (§2 of the paper).
  *
  * @param id       globally unique identifier (lets tests track inclusion
  *                 frequencies per item)
  * @param batch    index t of the batch B_t the item arrived in; the paper's
  *                 timestamp. Arbitrary real-valued arrival times are handled
  *                 by the samplers via the inter-arrival gap, not stored here.
  * @param payload  the data carried by the item (features, label, ...)
  */
final case class Item[+P](id: Long, batch: Int, payload: P)

/** Common interface for all batch-stream samplers in this repo.
  *
  * A sampler consumes batches `B_1, B_2, ...` in order via [[processBatch]]
  * and exposes the current realized sample S_t via [[sample]]. Implementations
  * are single-node and deterministic in their seed; the distributed versions
  * in `repro.dist` share the same driver-side weight logic.
  */
trait Sampler[P] {

  /** Ingest the next batch (possibly empty) and advance time by one unit. */
  def processBatch(batch: IndexedSeq[Item[P]]): Unit

  /** The current realized sample S_t. For R-TBS this draws the partial item
    * per eq. (2); repeated calls between batches re-randomize only the
    * partial item, matching the paper's "output S" per time step.
    */
  def sample: IndexedSeq[Item[P]]

  /** Human-readable name for bench tables. */
  def name: String
}
