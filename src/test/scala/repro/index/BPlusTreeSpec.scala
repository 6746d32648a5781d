package repro.index

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite

import repro.PropSupport
import repro.core.{Elem, LongVec}

class BPlusTreeSpec extends AnyFunSuite with PropSupport {

  private def collect(t: BPlusTree, lo: Int, hi: Int): Seq[(Int, Int)] = {
    val out = new LongVec()
    t.rangeSearch(lo, hi, out)
    (0 until out.size).map(i => (Elem.key(out(i)), Elem.ref(out(i))))
  }

  test("empty tree returns nothing") {
    val t = new BPlusTree(8)
    assert(t.size == 0)
    assert(collect(t, 0, Int.MaxValue).isEmpty)
  }

  test("single element is found") {
    val t = new BPlusTree(8)
    t.insert(5, 1)
    assert(collect(t, 0, 10) == Seq((5, 1)))
    assert(collect(t, 5, 5) == Seq((5, 1)))
    assert(collect(t, 6, 10).isEmpty)
    assert(collect(t, 0, 4).isEmpty)
  }

  for (fanout <- Seq(4, 8, 16, 32); n <- Seq(10, 100, 2000)) {
    test(s"random inserts match sorted reference (fanout=$fanout, n=$n)") {
      val rnd = new Random(fanout * 1000 + n)
      val t   = new BPlusTree(fanout)
      val ref = ArrayBuffer.empty[(Int, Int)]
      (0 until n).foreach { i =>
        val k = rnd.nextInt(500)
        t.insert(k, i)
        ref += ((k, i))
      }
      assert(t.size == n)
      assert(collect(t, 0, 500).sorted == ref.sorted.toSeq)
      // a few random sub-ranges
      (0 until 20).foreach { _ =>
        val a  = rnd.nextInt(500)
        val b  = a + rnd.nextInt(100)
        val expected = ref.filter { case (k, _) => k >= a && k <= b }.sorted.toSeq
        assert(collect(t, a, b).sorted == expected)
      }
    }
  }

  for (fanout <- Seq(4, 16)) {
    test(s"duplicate keys are all retained and found (fanout=$fanout)") {
      val t = new BPlusTree(fanout)
      (0 until 300).foreach(i => t.insert(7, i))
      (0 until 100).foreach(i => t.insert(3, 1000 + i))
      assert(collect(t, 7, 7).map(_._2).sorted == (0 until 300))
      assert(collect(t, 3, 3).map(_._2).sorted == (1000 until 1100))
      assert(collect(t, 0, 10).size == 400)
    }
  }

  test("delete removes exactly the (key, ref) pair") {
    val t = new BPlusTree(8)
    (0 until 50).foreach(i => t.insert(9, i))
    assert(t.delete(9, 25))
    assert(!t.delete(9, 25)) // already gone
    assert(!t.delete(9, 999)) // never present
    assert(collect(t, 9, 9).map(_._2).sorted == ((0 until 50).filterNot(_ == 25)))
    assert(t.size == 49)
  }

  for (fanout <- Seq(4, 8, 16); n <- Seq(200, 2000)) {
    test(s"sliding-window insert/delete churn stays consistent (fanout=$fanout, n=$n)") {
      val rnd = new Random(42 + fanout + n)
      val w   = 64
      val t   = new BPlusTree(fanout)
      val window = ArrayBuffer.empty[(Int, Int)]
      (0 until n).foreach { i =>
        val k = rnd.nextInt(1000)
        if (window.length == w) {
          val (ok, or) = window.remove(0)
          assert(t.delete(ok, or))
        }
        t.insert(k, i)
        window += ((k, i))
      }
      assert(t.size == w)
      assert(collect(t, 0, 1000).sorted == window.sorted.toSeq)
    }
  }

  test("foreachElement yields all elements in key order") {
    val rnd = new Random(1)
    val t   = new BPlusTree(8)
    val ref = (0 until 1000).map { i => val k = rnd.nextInt(300); t.insert(k, i); (k, i) }
    val seen = ArrayBuffer.empty[Long]
    t.foreachElement(seen += _)
    assert(seen.map(Elem.key) == seen.map(Elem.key).sorted)
    assert(seen.map(e => (Elem.key(e), Elem.ref(e))).sorted == ref.sorted)
  }

  test("toSortedArray matches foreachElement") {
    val rnd = new Random(2)
    val t   = new BPlusTree(16)
    (0 until 500).foreach(i => t.insert(rnd.nextInt(100), i))
    val viaForeach = ArrayBuffer.empty[Long]
    t.foreachElement(viaForeach += _)
    assert(t.toSortedArray.toSeq == viaForeach.toSeq)
  }

  test("height grows logarithmically") {
    val t = new BPlusTree(16)
    val rnd = new Random(3)
    (0 until 100000).foreach(i => t.insert(rnd.nextInt(1 << 20), i))
    assert(t.height >= 3 && t.height <= 7, s"height=${t.height}")
  }

  test("memoryBytes is positive and grows with content") {
    val t = new BPlusTree(16)
    val m0 = t.memoryBytes
    (0 until 10000).foreach(i => t.insert(i, i))
    assert(t.memoryBytes > m0)
  }

  test("property: inserts then range query equals filtered reference") {
    val gen = Gen.listOf(Gen.zip(Gen.chooseNum(0, 200), Gen.chooseNum(0, 10000)))
    checkProp(Prop.forAll(gen, Gen.chooseNum(0, 200), Gen.chooseNum(0, 200)) { (pairs, a, b) =>
      val (lo, hi) = (math.min(a, b), math.max(a, b))
      val t = new BPlusTree(4)
      pairs.foreach { case (k, r) => t.insert(k, r) }
      val expected = pairs.filter { case (k, _) => k >= lo && k <= hi }.sorted
      collect(t, lo, hi).sorted == expected
    })
  }

  test("property: delete sequence equals multiset difference") {
    val gen = Gen.listOfN(60, Gen.chooseNum(0, 30))
    checkProp(Prop.forAll(gen) { keys =>
      val t = new BPlusTree(4)
      keys.zipWithIndex.foreach { case (k, i) => t.insert(k, i) }
      val (del, keep) = keys.zipWithIndex.partition(_._2 % 2 == 0)
      del.foreach { case (k, i) => assert(t.delete(k, i)) }
      collect(t, 0, 100).sorted == keep.sorted
    })
  }

  test("interleaved ascending and descending inserts stay sorted") {
    val t = new BPlusTree(8)
    (0 until 500).foreach { i => t.insert(i, i); t.insert(999 - i, 1000 + i) }
    val all = collect(t, 0, 1000)
    assert(all.map(_._1) == all.map(_._1).sorted)
    assert(all.size == 1000)
  }
}
