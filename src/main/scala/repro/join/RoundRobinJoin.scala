package repro.join

import java.util.concurrent.CyclicBarrier
import java.util.concurrent.atomic.AtomicLong

import repro.StreamGen.Workload
import repro.core.{Elem, LongVec}
import repro.index.BPlusTree

/** Context-insensitive (round-robin) window partitioning — the structure
  * behind low-latency handshake join, SplitJoin and BiStream
  * (Section 2.2.3, Fig. 3). Each of the P join-cores owns the window
  * tuples with `seq % P == core` and keeps them in a core-local index
  * (or, for NLWJ, a plain scan range); every arrival is propagated to all
  * cores, each produces its share of matches, and only the owner core
  * updates its local index.
  *
  * Cores sweep the arrival sequence independently in blocks with a
  * barrier between blocks (the fast-forward propagation of LHS);
  * correctness needs no locks because index state is core-local, which is
  * exactly the paper's point — and so is the cost: P local searches per
  * arrival instead of one shared-index search.
  */
object RoundRobinJoin {

  /** Multithreaded IBWJ on round-robin partitions with core-local
    * B+-Trees. Result order across cores is not preserved (a stated
    * drawback of context-insensitive partitioning); results are counted.
    */
  def ibwj(workload: Workload, wR: Int, wS: Int, diff: Int, cores: Int,
           fanout: Int = 16, blockSize: Int = 1024, timedFrom: Int = 0): JoinStats = {
    require(cores >= 1)
    val n = workload.length
    val (keysR, keysS, streamSeq) = materialize(workload)
    val resultTotal = new AtomicLong(0)
    val barrier     = new CyclicBarrier(cores)
    val steadyStart = new AtomicLong(0)

    val t0 = System.nanoTime()
    val threads = (0 until cores).map { core =>
      val t = new Thread(() => {
        val localR = new BPlusTree(fanout)
        val localS = new BPlusTree(fanout)
        val out    = new LongVec(16)
        var res    = 0L
        var block  = 0
        while (block < n) {
          val end = math.min(n, block + blockSize)
          var i   = block
          while (i < end) {
            if (i == timedFrom && core == 0) steadyStart.set(System.nanoTime())
            val isR = workload.fromR(i)
            val k   = workload.keys(i)
            val seq = streamSeq(i)
            if (i >= timedFrom) {
              // search: this core's share of the opposite window
              val opp = if (isR) localS else localR
              val lo  = if (k >= diff) k - diff else 0
              val hi  = if (k <= Int.MaxValue - diff) k + diff else Int.MaxValue
              out.clear()
              opp.rangeSearch(lo, hi, out)
              res += out.size // local indexes hold only live tuples
            }
            // owner core updates its local index of the arrival's stream
            if (seq % cores == core) {
              val own  = if (isR) localR else localS
              val ownW = if (isR) wR else wS
              val exp  = seq - ownW
              if (exp >= 0 && exp % cores == core)
                own.delete((if (isR) keysR else keysS)(exp), exp)
              own.insert(k, seq)
            } else {
              // expired tuple owned by this core but arrival owned by another
              val ownW = if (isR) wR else wS
              val exp  = seq - ownW
              if (exp >= 0 && exp % cores == core) {
                val own = if (isR) localR else localS
                own.delete((if (isR) keysR else keysS)(exp), exp)
              }
            }
            i += 1
          }
          barrier.await()
          block = end
        }
        resultTotal.addAndGet(res)
        ()
      }, s"rr-core-$core")
      t.setDaemon(true); t.start(); t
    }
    threads.foreach(_.join())
    val from = if (steadyStart.get == 0) t0 else steadyStart.get
    JoinStats(n - math.min(timedFrom, n), resultTotal.get, System.nanoTime() - from)
  }

  /** Multithreaded NLWJ on round-robin partitions: each core linearly
    * scans its share (`seq % P == core`) of the opposite window.
    */
  def nlwj(workload: Workload, wR: Int, wS: Int, diff: Int, cores: Int,
           blockSize: Int = 1024, timedFrom: Int = 0): JoinStats = {
    require(cores >= 1)
    val n = workload.length
    val (keysR, keysS, streamSeq) = materialize(workload)
    val resultTotal = new AtomicLong(0)
    val barrier     = new CyclicBarrier(cores)
    val steadyStart = new AtomicLong(0)
    // opposite-head per arrival, to bound the scan
    val oppHead = new Array[Int](n)
    locally {
      var r = 0; var s = 0; var i = 0
      while (i < n) {
        if (workload.fromR(i)) { oppHead(i) = s - 1; r += 1 }
        else { oppHead(i) = r - 1; s += 1 }
        i += 1
      }
    }

    val t0 = System.nanoTime()
    val threads = (0 until cores).map { core =>
      val t = new Thread(() => {
        var res   = 0L
        var block = 0
        while (block < n) {
          val end = math.min(n, block + blockSize)
          var i   = block
          while (i < end) {
            if (i == timedFrom && core == 0) steadyStart.set(System.nanoTime())
            val isR     = workload.fromR(i)
            val k       = workload.keys(i)
            val oppKeys = if (isR) keysS else keysR
            val oppW    = if (isR) wS else wR
            val tl      = oppHead(i)
            if (tl >= 0 && i >= timedFrom) {
              val te = math.max(0, tl - oppW + 1)
              // start at the first owned seq >= te
              var j = te + ((core - te % cores + cores) % cores)
              while (j <= tl) {
                if (math.abs(oppKeys(j).toLong - k) <= diff) res += 1
                j += cores
              }
            }
            i += 1
          }
          barrier.await()
          block = end
        }
        resultTotal.addAndGet(res)
        ()
      }, s"rr-nlwj-$core")
      t.setDaemon(true); t.start(); t
    }
    threads.foreach(_.join())
    val from = if (steadyStart.get == 0) t0 else steadyStart.get
    JoinStats(n - math.min(timedFrom, n), resultTotal.get, System.nanoTime() - from)
  }

  private def materialize(workload: Workload): (Array[Int], Array[Int], Array[Int]) = {
    val n = workload.length
    var c = 0; var i = 0
    while (i < n) { if (workload.fromR(i)) c += 1; i += 1 }
    val keysR     = new Array[Int](c)
    val keysS     = new Array[Int](n - c)
    val streamSeq = new Array[Int](n)
    var r = 0; var s = 0
    i = 0
    while (i < n) {
      if (workload.fromR(i)) { keysR(r) = workload.keys(i); streamSeq(i) = r; r += 1 }
      else { keysS(s) = workload.keys(i); streamSeq(i) = s; s += 1 }
      i += 1
    }
    (keysR, keysS, streamSeq)
  }
}
