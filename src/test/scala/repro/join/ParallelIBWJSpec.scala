package repro.join

import org.scalatest.funsuite.AnyFunSuite

import repro.{StreamGen, TestRefs}
import repro.index._

class ParallelIBWJSpec extends AnyFunSuite {

  private def workload(n: Int, keySpace: Int, seed: Long) =
    StreamGen.twoWay(StreamGen.uniform(n / 2, keySpace, seed),
                     StreamGen.uniform(n - n / 2, keySpace, seed + 50))

  private def pim(w: Int, m: Double = 0.5, dI: Int = 2) =
    new PIMTree(dI, math.max(1, (m * w).toInt))

  for (threads <- Seq(1, 2, 4, 8); taskSizeV <- Seq(1, 8)) {
    test(s"parallel PIM join equals reference (threads=$threads, taskSize=$taskSizeV)") {
      val w    = 128
      val wl   = workload(4000, 1 << 12, threads * 10 + taskSizeV)
      val diff = 25
      val sink = new CollectingSink
      val join = new ParallelIBWJ(wl, w, w, diff, pim(w), pim(w), threads, taskSizeV)
      val stats = join.run(sink)
      val ref = TestRefs.referencePairs(wl, w, w, diff)
      assert(sink.pairs.sorted.toVector == ref.sorted)
      assert(stats.results == ref.size)
    }
  }

  for (nonblocking <- Seq(true, false)) {
    val label = if (nonblocking) "nonblocking" else "blocking"
    test(s"many merges mid-run lose nothing ($label merge)") {
      val w    = 64
      val wl   = workload(6000, 1 << 10, 42)
      val diff = 10
      val sink = new CollectingSink
      val join = new ParallelIBWJ(wl, w, w, diff, pim(w, m = 0.25), pim(w, m = 0.25),
                                  numThreads = 4, taskSize = 4, nonblockingMerge = nonblocking)
      join.run(sink)
      val ref = TestRefs.referencePairs(wl, w, w, diff)
      assert(sink.pairs.sorted.toVector == ref.sorted)
    }
  }

  test("result propagation preserves arrival order") {
    val w    = 96
    val wl   = workload(3000, 1 << 10, 7)
    val diff = 12
    val sink = new CollectingSink
    new ParallelIBWJ(wl, w, w, diff, pim(w), pim(w), 8, 4).run(sink)
    val groups = TestRefs.referenceGroups(wl, w, w, diff)
    val norm   = TestRefs.normalizeByGroups(sink.pairs.toSeq, groups)
    assert(norm == groups.map(_.sorted))
  }

  test("self-join parallel equals reference") {
    val w    = 128
    val keys = StreamGen.uniform(4000, 1 << 12, 9)
    val wl   = StreamGen.selfJoin(keys)
    val diff = 20
    val sink = new CollectingSink
    new ParallelIBWJ(wl, w, w, diff, pim(w), pim(w), 8, 8, selfJoin = true).run(sink)
    val ref = TestRefs.referencePairs(wl, w, w, diff, selfJoin = true)
    assert(sink.pairs.sorted.toVector == ref.sorted)
  }

  test("self-join with merges equals reference") {
    val w    = 64
    val keys = StreamGen.uniform(5000, 1 << 10, 10)
    val wl   = StreamGen.selfJoin(keys)
    val diff = 8
    val sink = new CollectingSink
    new ParallelIBWJ(wl, w, w, diff, pim(w, m = 0.25), pim(w, m = 0.25),
                     4, 4, selfJoin = true).run(sink)
    val ref = TestRefs.referencePairs(wl, w, w, diff, selfJoin = true)
    assert(sink.pairs.sorted.toVector == ref.sorted)
  }

  test("asymmetric windows parallel equals reference") {
    val wl   = workload(3000, 1 << 10, 11)
    val (wR, wS) = (32, 256)
    val diff = 10
    val sink = new CollectingSink
    new ParallelIBWJ(wl, wR, wS, diff, pim(wR), pim(wS), 8, 8).run(sink)
    val ref = TestRefs.referencePairs(wl, wR, wS, diff)
    assert(sink.pairs.sorted.toVector == ref.sorted)
  }

  test("asymmetric rates parallel equals reference") {
    val rKeys = StreamGen.uniform(2400, 1 << 10, 12)
    val sKeys = StreamGen.uniform(600, 1 << 10, 13)
    val wl    = StreamGen.ratio(rKeys, sKeys, 4, 1)
    val w     = 128
    val diff  = 10
    val sink  = new CollectingSink
    new ParallelIBWJ(wl, w, w, diff, pim(w), pim(w), 8, 8).run(sink)
    val ref = TestRefs.referencePairs(wl, w, w, diff)
    assert(sink.pairs.sorted.toVector == ref.sorted)
  }

  test("Bw-Tree shared index under the parallel algorithm equals reference") {
    val w    = 128
    val wl   = workload(4000, 1 << 12, 14)
    val diff = 20
    def bw() = new BwTree(1 << 12, 2 * w, targetLeafSize = 16)
    val sink = new CollectingSink
    new ParallelIBWJ(wl, w, w, diff, bw(), bw(), 8, 8).run(sink)
    val ref = TestRefs.referencePairs(wl, w, w, diff)
    assert(sink.pairs.sorted.toVector == ref.sorted)
  }

  test("parallel equals single-threaded on a larger run (count + checksum)") {
    val w    = 1 << 10
    val n    = 30000
    val ks   = 1 << 16
    val wl   = workload(n, ks, 15)
    val diff = StreamGen.diffForMatchRate(w, 2.0, ks)
    val single = new CountingSink
    SingleThreadedJoin.ibwj(wl, w, w, diff, pim(w), pim(w), single)
    val par = new CountingSink
    new ParallelIBWJ(wl, w, w, diff, pim(w), pim(w), 8, 8).run(par)
    assert(par.count == single.count)
    assert(par.checksum == single.checksum)
  }

  test("latency tracking records per-tuple latencies") {
    val w    = 128
    val wl   = workload(2000, 1 << 10, 16)
    val join = new ParallelIBWJ(wl, w, w, 10, pim(w), pim(w), 4, 4, trackLatency = true)
    join.run(new CountingSink)
    assert(join.latencyCount.get == wl.length)
    assert(join.latencySumNanos.get > 0)
  }

  test("single worker with task size 1 still drains and orders correctly") {
    val w    = 32
    val wl   = workload(500, 1 << 8, 17)
    val sink = new CollectingSink
    new ParallelIBWJ(wl, w, w, 4, pim(w, m = 0.25), pim(w, m = 0.25), 1, 1).run(sink)
    val groups = TestRefs.referenceGroups(wl, w, w, 4)
    assert(TestRefs.normalizeByGroups(sink.pairs.toSeq, groups) == groups.map(_.sorted))
  }

  test("empty workload completes immediately") {
    val wl = StreamGen.Workload(Array.emptyBooleanArray, Array.emptyIntArray)
    val stats = new ParallelIBWJ(wl, 16, 16, 5, pim(16), pim(16), 4, 8).run(new CountingSink)
    assert(stats.tuples == 0 && stats.results == 0)
  }

  test("stress: repeated concurrent runs stay correct") {
    (0 until 5).foreach { trial =>
      val w    = 64
      val wl   = workload(3000, 1 << 10, 100 + trial)
      val diff = 8
      val sink = new CollectingSink
      new ParallelIBWJ(wl, w, w, diff, pim(w, m = 0.25, dI = 1 + trial % 3),
                       pim(w, m = 0.25, dI = 1 + trial % 3), 8, 2).run(sink)
      val ref = TestRefs.referencePairs(wl, w, w, diff)
      assert(sink.pairs.sorted.toVector == ref.sorted, s"trial=$trial")
    }
  }
}
