package repro.join

import scala.collection.mutable.ArrayBuffer

/** Receives window-join result pairs as (rSeq, sSeq) stream-local
  * sequence numbers. For self-joins the pair is (probeSeq, matchSeq).
  */
trait ResultSink {
  def emit(rSeq: Int, sSeq: Int): Unit
}

/** Counts results and keeps an order-insensitive checksum so differently
  * parallelised runs can be compared cheaply.
  */
final class CountingSink extends ResultSink {
  var count: Long    = 0
  var checksum: Long = 0
  override def emit(rSeq: Int, sSeq: Int): Unit = {
    count += 1
    checksum += (rSeq.toLong * 1000003L) ^ (sSeq.toLong * 998244353L)
  }
}

/** Collects every pair — test-sized runs only. */
final class CollectingSink extends ResultSink {
  val pairs = new ArrayBuffer[(Int, Int)]
  override def emit(rSeq: Int, sSeq: Int): Unit = pairs += ((rSeq, sSeq))
}

/** Wall-clock stats of one join run. */
final case class JoinStats(tuples: Long, results: Long, nanos: Long) {
  /** processed input tuples per second */
  def throughput: Double = if (nanos == 0) 0 else tuples * 1e9 / nanos
}
