package repro.index

import scala.collection.mutable.ArrayDeque

import repro.core.LongVec

/** Chained index (Section 2.2.2, [20, 21]): the window is cut into arrival
  * intervals of `segmentSize` tuples, each indexed by its own subindex.
  * New tuples go to the active subindex; when it fills it is archived and
  * a fresh one starts. An archived subindex is dropped wholesale once all
  * of its tuples have expired — coarse-grained disposal.
  *
  * Two archive designs from the paper's evaluation (Fig. 8b):
  *  - B-chain  (`immutableArchive = false`): archived subindexes stay
  *    classic B+-Trees.
  *  - IB-chain (`immutableArchive = true`): a subindex is converted into
  *    an immutable B+-Tree on archiving, trading a one-off O(n) rebuild
  *    for faster searches.
  */
final class ChainedIndex(
    val segmentSize: Int,
    val immutableArchive: Boolean,
    val bFanout: Int = 16,
    val ibFanout: Int = ImmutableBPlusTree.DefaultFanout,
    val ibLeafSize: Int = ImmutableBPlusTree.DefaultLeafNodeSize,
) extends WindowIndex {
  require(segmentSize >= 1)

  private final class Segment(val index: AnyRef, val maxRef: Int)

  private var active                       = new BPlusTree(bFanout)
  private var activeMaxRef                 = -1
  private val archived: ArrayDeque[Segment] = ArrayDeque.empty

  override def name: String = if (immutableArchive) "IB-chain" else "B-chain"

  override def insert(key: Int, ref: Int): Unit = {
    active.insert(key, ref)
    if (ref > activeMaxRef) activeMaxRef = ref
    if (active.size >= segmentSize) {
      val idx: AnyRef =
        if (immutableArchive) ImmutableBPlusTree.build(active.toSortedArray, ibFanout, ibLeafSize)
        else active
      archived.append(new Segment(idx, activeMaxRef))
      active = new BPlusTree(bFanout)
      activeMaxRef = -1
    }
  }

  override def expire(key: Int, ref: Int): Unit = () // coarse disposal

  override def rangeSearch(lo: Int, hi: Int, out: LongVec): Unit = {
    val it = archived.iterator
    while (it.hasNext) {
      it.next().index match {
        case b: BPlusTree           => b.rangeSearch(lo, hi, out)
        case ib: ImmutableBPlusTree => ib.rangeSearch(lo, hi, out)
      }
    }
    active.rangeSearch(lo, hi, out)
  }

  override def maintain(validFrom: Int): Unit = {
    // drop whole segments whose newest tuple has expired
    while (archived.nonEmpty && archived.head.maxRef < validFrom)
      archived.removeHead()
  }

  /** Number of live subindexes, the active one included. */
  def chainLength: Int = archived.length + 1

  override def size: Int = {
    var n = active.size
    val it = archived.iterator
    while (it.hasNext) n += (it.next().index match {
      case b: BPlusTree           => b.size
      case ib: ImmutableBPlusTree => ib.size
    })
    n
  }

  override def memoryBytes: Long = {
    var bytes = active.memoryBytes
    val it = archived.iterator
    while (it.hasNext) bytes += (it.next().index match {
      case b: BPlusTree           => b.memoryBytes
      case ib: ImmutableBPlusTree => ib.memoryBytes
    })
    bytes
  }
}
