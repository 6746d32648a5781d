package repro.index

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

import org.scalatest.funsuite.AnyFunSuite

import repro.core.{Elem, LongVec}

class PIMTreeSpec extends AnyFunSuite {

  private def collect(t: WindowIndex, lo: Int, hi: Int): Seq[(Int, Int)] = {
    val out = new LongVec()
    t.rangeSearch(lo, hi, out)
    (0 until out.size).map(i => (Elem.key(out(i)), Elem.ref(out(i))))
  }

  test("fresh PIM-Tree has a single partition and empty T_S") {
    val t = new PIMTree(2, 100)
    assert(t.currentState.numPartitions == 1)
    assert(t.size == 0 && t.tiSize == 0)
    assert(collect(t, 0, Int.MaxValue).isEmpty)
  }

  test("inserts land in T_I until the merge threshold") {
    val t = new PIMTree(2, 10)
    (0 until 9).foreach(i => t.insert(i * 10, i))
    assert(t.tiSize == 9 && !t.needsMerge)
    t.insert(90, 9)
    assert(t.needsMerge)
    t.maintain(0)
    assert(t.tiSize == 0)
    assert(t.currentState.ts.size == 10)
    assert(collect(t, 0, 1000).size == 10)
  }

  test("merge drops expired T_S entries; T_I carries over unfiltered") {
    val t = new PIMTree(1, 8)
    (0 until 8).foreach(i => t.insert(i, i))
    t.merge(0) // nothing expired
    assert(t.currentState.ts.size == 8)
    (8 until 16).foreach(i => t.insert(i, i))
    // paper semantics: the merge eliminates expired tuples *of T_S* only;
    // T_I entries (refs 8..15, two already expired) go in as-is and get
    // dropped at the *next* merge — searches filter by ref meanwhile
    t.merge(10)
    assert(t.currentState.ts.size == 8)
    assert(collect(t, 0, 100).map(_._2).sorted == (8 until 16))
    assert(collect(t, 0, 100).map(_._2).filter(_ >= 10).sorted == (10 until 16))
    t.merge(10) // second merge disposes the stragglers
    assert(t.currentState.ts.size == 6)
  }

  for (dI <- Seq(0, 1, 2, 3); n <- Seq(100, 5000)) {
    test(s"search equals reference across merges (dI=$dI, n=$n)") {
      val rnd = new Random(dI * 100 + n)
      val w   = 256
      val t   = new PIMTree(dI, 64)
      val live = ArrayBuffer.empty[(Int, Int)]
      (0 until n).foreach { i =>
        val k = rnd.nextInt(2000)
        t.insert(k, i)
        live += ((k, i))
        val validFrom = math.max(0, i + 1 - w)
        live.filterInPlace(_._2 >= validFrom)
        t.maintain(validFrom)
        if (i % 97 == 0) {
          val a = rnd.nextInt(2000)
          val b = a + rnd.nextInt(300)
          val got = collect(t, a, b).filter(_._2 >= validFrom).sorted
          val expected = live.filter { case (k2, _) => k2 >= a && k2 <= b }.sorted.toSeq
          assert(got == expected, s"range [$a,$b] at i=$i")
        }
      }
    }
  }

  test("partitions multiply after a merge at dI >= 1") {
    val rnd = new Random(5)
    val t   = new PIMTree(2, 1 << 14)
    (0 until (1 << 14)).foreach(i => t.insert(rnd.nextInt(1 << 24), i))
    assert(t.currentState.numPartitions == 1) // nothing merged yet
    t.merge(0)
    assert(t.currentState.numPartitions > 1, s"partitions=${t.currentState.numPartitions}")
    // routing agrees with the partition bounds
    val s = t.currentState
    (0 until 200).foreach { _ =>
      val k = rnd.nextInt(1 << 24)
      val p = s.ts.nodeIndexAtLevel(k, s.level)
      assert(k <= s.upper(p))
      if (p > 0) assert(k > s.upper(p - 1))
    }
  }

  test("IM-Tree factory has one partition regardless of size") {
    val rnd = new Random(6)
    val t   = PIMTree.imTree(1 << 12)
    (0 until (1 << 12)).foreach(i => t.insert(rnd.nextInt(1 << 20), i))
    t.merge(0)
    assert(t.currentState.numPartitions == 1)
    assert(t.name == "IM-Tree")
    (0 until (1 << 10)).foreach(i => t.insert(rnd.nextInt(1 << 20), 5000 + i))
    assert(collect(t, 0, 1 << 20).size == (1 << 12) + (1 << 10))
  }

  test("two-phase merge (build + install) equals one-shot merge") {
    val rnd = new Random(7)
    val t1  = new PIMTree(2, 1000)
    val t2  = new PIMTree(2, 1000)
    val entries = (0 until 1000).map(i => (rnd.nextInt(10000), i))
    entries.foreach { case (k, r) => t1.insert(k, r); t2.insert(k, r) }
    t1.merge(200)
    val st = t2.buildMergedState(200)
    t2.installState(st)
    assert(collect(t1, 0, 10000) == collect(t2, 0, 10000))
    assert(t1.currentState.numPartitions == t2.currentState.numPartitions)
  }

  test("searches during phase 1 of a nonblocking merge see the old state") {
    val rnd = new Random(8)
    val t   = new PIMTree(1, 500)
    (0 until 500).foreach(i => t.insert(rnd.nextInt(1000), i))
    t.merge(0) // move everything into T_S so expiry filtering applies
    val before = collect(t, 0, 1000)
    val st     = t.buildMergedState(100) // phase 1: old state untouched
    assert(collect(t, 0, 1000) == before)
    assert(before.size == 500)
    t.installState(st)
    assert(collect(t, 0, 1000).forall(_._2 >= 100))
    assert(collect(t, 0, 1000).size == 400)
  }

  test("concurrent inserts are all retained") {
    val t       = new PIMTree(2, Int.MaxValue)
    // pre-build T_S so there are several partitions to contend on
    val rnd = new Random(9)
    (0 until 20000).foreach(i => t.insert(rnd.nextInt(1 << 20), i))
    t.merge(0)
    val threads = 8
    val perThread = 5000
    val ts = (0 until threads).map { tid =>
      val th = new Thread(() => {
        val r = new Random(100 + tid)
        (0 until perThread).foreach { j =>
          t.insert(r.nextInt(1 << 20), 100000 + tid * perThread + j)
        }
      })
      th.start(); th
    }
    ts.foreach(_.join())
    assert(t.tiSize == threads * perThread)
    val all = collect(t, 0, 1 << 20)
    assert(all.size == 20000 + threads * perThread)
    assert(all.count(_._2 >= 100000) == threads * perThread)
  }

  test("concurrent readers and writers do not lose entries (smoke)") {
    val t = new PIMTree(2, Int.MaxValue)
    val rnd = new Random(11)
    (0 until 10000).foreach(i => t.insert(rnd.nextInt(1 << 16), i))
    t.merge(0)
    val stop = new java.util.concurrent.atomic.AtomicBoolean(false)
    val readers = (0 until 4).map { tid =>
      val th = new Thread(() => {
        val r   = new Random(tid)
        val out = new LongVec()
        while (!stop.get) {
          out.clear()
          val a = r.nextInt(1 << 16)
          t.rangeSearch(a, a + 500, out)
        }
      })
      th.start(); th
    }
    val writers = (0 until 4).map { tid =>
      val th = new Thread(() => {
        val r = new Random(50 + tid)
        (0 until 20000).foreach(j => t.insert(r.nextInt(1 << 16), 50000 + tid * 20000 + j))
      })
      th.start(); th
    }
    writers.foreach(_.join())
    stop.set(true)
    readers.foreach(_.join())
    assert(t.tiSize == 80000)
  }

  test("insert distribution tracking records per-partition counts") {
    val rnd = new Random(12)
    val t   = new PIMTree(2, 1 << 12)
    (0 until (1 << 12)).foreach(i => t.insert(rnd.nextInt(1 << 20), i))
    t.merge(0)
    t.trackInsertDistribution(true)
    (0 until 5000).foreach(i => t.insert(rnd.nextInt(1 << 20), 10000 + i))
    val dist = t.insertDistribution
    assert(dist.sum == 5000)
    assert(dist.count(_ > 0) > 1, "uniform keys should hit several partitions")
    t.trackInsertDistribution(false)
    assert(t.insertDistribution.isEmpty)
  }

  test("memoryBytes includes both components plus merge buffer") {
    val t = new PIMTree(2, 1 << 10)
    val rnd = new Random(13)
    (0 until (1 << 10)).foreach(i => t.insert(rnd.nextInt(1 << 16), i))
    t.merge(0)
    val afterMerge = t.memoryBytes
    assert(afterMerge >= (1 << 10) * 8L)
    (0 until (1 << 10)).foreach(i => t.insert(rnd.nextInt(1 << 16), 2000 + i))
    assert(t.memoryBytes > afterMerge)
  }

  test("merge cost accounting increments") {
    val t = new PIMTree(1, 100)
    val rnd = new Random(14)
    (0 until 100).foreach(i => t.insert(rnd.nextInt(1000), i))
    t.maintain(0)
    assert(t.mergeCount == 1)
    assert(t.totalMergeNanos > 0)
  }
}
