package repro.index

import repro.core.LongVec

/** A sliding-window index as the window join uses it (Section 2.2).
  *
  * Refs are stream-local arrival sequence numbers; a tuple is live iff
  * `ref >= validFrom` where `validFrom = head - w + 1`. Implementations
  * with coarse-grained disposal (IM/PIM-Tree, chained index) may return
  * expired entries from `rangeSearch` — the join filters by ref, exactly
  * like the paper's expired-flag check against the sliding window.
  */
trait WindowIndex {
  def name: String

  /** Index a newly arrived tuple. */
  def insert(key: Int, ref: Int): Unit

  /** A tuple left the window. Indexes with incremental deletion (B+-Tree)
    * remove it; coarse-disposal indexes ignore the call.
    */
  def expire(key: Int, ref: Int): Unit

  /** Collect candidate entries with lo <= key <= hi (packed elements).
    * May include expired refs; the caller filters.
    */
  def rangeSearch(lo: Int, hi: Int, out: LongVec): Unit

  /** Periodic maintenance (merge / segment disposal). `validFrom` is the
    * earliest live ref of the owning window.
    */
  def maintain(validFrom: Int): Unit

  /** Number of entries currently stored (including not-yet-disposed
    * expired entries for coarse-disposal indexes).
    */
  def size: Int

  /** Approximate heap footprint in bytes. */
  def memoryBytes: Long
}

/** Baseline: one classic B+-Tree per window with per-tuple deletes
  * (Section 2.2.1).
  */
final class BPlusWindowIndex(fanout: Int = 16) extends WindowIndex {
  val tree = new BPlusTree(fanout)

  override def name: String = "B+-Tree"
  override def insert(key: Int, ref: Int): Unit = tree.insert(key, ref)
  override def expire(key: Int, ref: Int): Unit = { tree.delete(key, ref); () }
  override def rangeSearch(lo: Int, hi: Int, out: LongVec): Unit = tree.rangeSearch(lo, hi, out)
  override def maintain(validFrom: Int): Unit = ()
  override def size: Int = tree.size
  override def memoryBytes: Long = tree.memoryBytes
}
