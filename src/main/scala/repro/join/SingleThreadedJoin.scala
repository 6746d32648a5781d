package repro.join

import repro.StreamGen.Workload
import repro.core.{Elem, IntVec, LongVec, Telemetry}
import repro.index.WindowIndex

/** Per-step time accounting for the cost-breakdown experiment (Fig. 9b).
  * All values are nanoseconds summed over the run.
  */
final class StepTimers {
  var searchNanos: Long = 0 // index traversal to the first match
  var scanNanos: Long   = 0 // leaf scan + expiry filtering beyond traversal
  var insertNanos: Long = 0
  var deleteNanos: Long = 0
  var mergeNanos: Long  = 0
}

/** Single-threaded window band join runners: nested-loop (NLWJ) and
  * index-based (IBWJ) over any [[WindowIndex]] (Sections 2.1–2.2).
  *
  * Stream-local sequence numbers are the sliding-window references; the
  * window content of stream X right after its n-th tuple arrived is the
  * seq range [n - w, n - 1]. Expired entries possibly returned by
  * coarse-disposal indexes are filtered here by ref — the moral
  * equivalent of the paper's expired-flag check.
  */
object SingleThreadedJoin {

  /** Nested-loop window join: probe = linear scan of the opposite window.
    *
    * @param timedFrom arrivals before this index only fill the windows
    *                  (no probe, no timing) — steady-state measurement
    */
  def nlwj(workload: Workload, wR: Int, wS: Int, diff: Int, sink: ResultSink,
           selfJoin: Boolean = false, timedFrom: Int = 0): JoinStats = {
    val n     = workload.length
    val keysR = new IntVec(n)
    val keysS = if (selfJoin) keysR else new IntVec(n)
    var res   = 0L
    var t0    = System.nanoTime()
    var i     = 0
    while (i < n) {
      if (i == timedFrom) t0 = System.nanoTime()
      val fromR = workload.fromR(i) && !selfJoin
      val k     = workload.keys(i)
      if (i >= timedFrom) {
        val (oppKeys, oppW) = if (fromR || selfJoin) (keysS, wS) else (keysR, wR)
        val tl = oppKeys.size - 1
        var j  = math.max(0, oppKeys.size - oppW)
        while (j <= tl) {
          if (math.abs(oppKeys(j).toLong - k) <= diff) {
            res += 1
            if (fromR || selfJoin) sink.emit(keysR.size, j)
            else sink.emit(j, keysS.size)
          }
          j += 1
        }
      }
      if (fromR || selfJoin) keysR.add(k) else keysS.add(k)
      i += 1
    }
    JoinStats(n - timedFrom, res, System.nanoTime() - t0)
  }

  /** Index-based window join, Section 2.2: per arrival — (1) probe the
    * opposite index, (2) delete/flag the expired own tuple, (3) insert
    * into the own index, then run index maintenance (merges, segment
    * disposal).
    *
    * @param timers when non-null, per-step nanos are accumulated (the
    *               runner then pays ~4 extra nanoTime calls per tuple, so
    *               keep it off for throughput measurements)
    */
  def ibwj(workload: Workload, wR: Int, wS: Int, diff: Int,
           indexR: WindowIndex, indexS: WindowIndex, sink: ResultSink,
           selfJoin: Boolean = false, timers: StepTimers = null,
           timedFrom: Int = 0): JoinStats = {
    val n     = workload.length
    val keysR = new IntVec(math.max(16, n / 2 + 2))
    val keysS = if (selfJoin) keysR else new IntVec(math.max(16, n / 2 + 2))
    val out   = new LongVec(64)
    var res   = 0L
    var t0    = System.nanoTime()
    var i     = 0
    while (i < n) {
      if (i == timedFrom) t0 = System.nanoTime()
      val tm       = if (i >= timedFrom) timers else null
      val fromR    = workload.fromR(i) && !selfJoin
      val k        = workload.keys(i)
      val probeSelf = selfJoin
      val (oppIdx, oppKeys, oppW) =
        if (fromR) (indexS, keysS, wS)
        else if (probeSelf) (indexR, keysR, wR)
        else (indexR, keysR, wR)
      val (ownIdx, ownKeys, ownW) =
        if (fromR || probeSelf) (indexR, keysR, wR) else (indexS, keysS, wS)

      // Step 1: probe
      val oppValidFrom = math.max(0, oppKeys.size - oppW)
      val lo = if (k >= diff) k - diff else 0
      val hi = if (k <= Int.MaxValue - diff) k + diff else Int.MaxValue
      out.clear()
      if (tm != null) {
        var t = System.nanoTime()
        oppIdx.rangeSearch(lo, lo - 1, new LongVec(1)) // traversal only
        val t1 = System.nanoTime()
        tm.searchNanos += t1 - t
        t = t1
        oppIdx.rangeSearch(lo, hi, out)
        tm.scanNanos += System.nanoTime() - t
      } else oppIdx.rangeSearch(lo, hi, out)
      var j = 0
      while (j < out.size) {
        val ref = Elem.ref(out(j))
        if (ref >= oppValidFrom) {
          res += 1
          if (fromR || probeSelf) sink.emit(ownKeys.size, ref) else sink.emit(ref, ownKeys.size)
          Telemetry.load(8)
        }
        j += 1
      }

      // Step 2: expire (incremental indexes delete; others flag-only)
      val seq = ownKeys.size
      if (seq >= ownW) {
        val exp = seq - ownW
        if (tm != null) {
          val t = System.nanoTime()
          ownIdx.expire(ownKeys(exp), exp)
          tm.deleteNanos += System.nanoTime() - t
        } else ownIdx.expire(ownKeys(exp), exp)
      }

      // Step 3: insert + maintenance
      ownKeys.add(k)
      if (tm != null) {
        var t = System.nanoTime()
        ownIdx.insert(k, seq)
        val t1 = System.nanoTime()
        tm.insertNanos += t1 - t
        ownIdx.maintain(math.max(0, ownKeys.size - ownW))
        tm.mergeNanos += System.nanoTime() - t1
      } else {
        ownIdx.insert(k, seq)
        ownIdx.maintain(math.max(0, ownKeys.size - ownW))
      }
      Telemetry.store(8)
      i += 1
    }
    JoinStats(n - timedFrom, res, System.nanoTime() - t0)
  }
}
