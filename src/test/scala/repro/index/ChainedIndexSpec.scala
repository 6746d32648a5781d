package repro.index

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

import org.scalatest.funsuite.AnyFunSuite

import repro.core.{Elem, LongVec}

class ChainedIndexSpec extends AnyFunSuite {

  private def collect(t: WindowIndex, lo: Int, hi: Int): Seq[(Int, Int)] = {
    val out = new LongVec()
    t.rangeSearch(lo, hi, out)
    (0 until out.size).map(i => (Elem.key(out(i)), Elem.ref(out(i))))
  }

  for (immutable <- Seq(false, true)) {
    val label = if (immutable) "IB-chain" else "B-chain"

    test(s"$label: inserts are searchable before and after archiving") {
      val t = new ChainedIndex(segmentSize = 10, immutableArchive = immutable)
      (0 until 25).foreach(i => t.insert(i * 2, i))
      assert(t.size == 25)
      assert(t.chainLength == 3) // two archived segments + active
      assert(collect(t, 0, 100).map(_._2).sorted == (0 until 25))
      assert(collect(t, 10, 20).map(_._1).forall(k => k >= 10 && k <= 20))
    }

    test(s"$label: maintain drops fully expired segments only") {
      val t = new ChainedIndex(segmentSize = 10, immutableArchive = immutable)
      (0 until 40).foreach(i => t.insert(i, i))
      assert(t.chainLength == 5)
      t.maintain(10) // first segment (refs 0..9) fully expired
      assert(t.chainLength == 4)
      t.maintain(9) // no-op: nothing newly expired
      assert(t.chainLength == 4)
      t.maintain(25) // segments of refs 10..19 expired; 20..29 partially live
      assert(t.chainLength == 3)
      assert(collect(t, 0, 100).map(_._2).min == 20) // coarse disposal keeps 20..24
    }

    test(s"$label: sliding-window behaviour matches reference when filtered") {
      val rnd = new Random(if (immutable) 1 else 2)
      val w   = 64
      val t   = new ChainedIndex(segmentSize = w / 4, immutableArchive = immutable)
      val live = ArrayBuffer.empty[(Int, Int)]
      (0 until 2000).foreach { i =>
        val k = rnd.nextInt(500)
        t.insert(k, i)
        live += ((k, i))
        val validFrom = math.max(0, i + 1 - w)
        live.filterInPlace(_._2 >= validFrom)
        t.maintain(validFrom)
        if (i % 53 == 0) {
          val a = rnd.nextInt(500)
          val b = a + rnd.nextInt(100)
          val got = collect(t, a, b).filter(_._2 >= validFrom).sorted
          val expected = live.filter { case (k2, _) => k2 >= a && k2 <= b }.sorted.toSeq
          assert(got == expected)
        }
      }
      // chain never grows without bound: w/segmentSize + ~2 slack
      assert(t.chainLength <= 7, s"chainLength=${t.chainLength}")
    }

    test(s"$label: duplicates across segments are all found") {
      val t = new ChainedIndex(segmentSize = 5, immutableArchive = immutable)
      (0 until 30).foreach(i => t.insert(7, i))
      assert(collect(t, 7, 7).size == 30)
    }

    test(s"$label: expire is a no-op (coarse disposal)") {
      val t = new ChainedIndex(segmentSize = 10, immutableArchive = immutable)
      (0 until 5).foreach(i => t.insert(i, i))
      t.expire(0, 0)
      assert(t.size == 5)
    }

    test(s"$label: memoryBytes positive and grows") {
      val t = new ChainedIndex(segmentSize = 16, immutableArchive = immutable)
      val m0 = t.memoryBytes
      (0 until 1000).foreach(i => t.insert(i, i))
      assert(t.memoryBytes > m0)
    }
  }

  test("IB-chain archives as immutable trees, B-chain as classic") {
    // indirectly: both give identical query results on identical input
    val rnd = new Random(3)
    val b  = new ChainedIndex(16, immutableArchive = false)
    val ib = new ChainedIndex(16, immutableArchive = true)
    (0 until 500).foreach { i =>
      val k = rnd.nextInt(300)
      b.insert(k, i); ib.insert(k, i)
    }
    assert(collect(b, 0, 300).sorted == collect(ib, 0, 300).sorted)
  }
}
