package repro

import org.scalatest.funsuite.AnyFunSuite

class StreamGenSpec extends AnyFunSuite {

  test("uniform is deterministic in seed and bounded by the key space") {
    val a = StreamGen.uniform(5000, 1 << 16, seed = 1)
    val b = StreamGen.uniform(5000, 1 << 16, seed = 1)
    val c = StreamGen.uniform(5000, 1 << 16, seed = 2)
    assert(a.toSeq == b.toSeq)
    assert(a.toSeq != c.toSeq)
    assert(a.forall(k => k >= 0 && k < (1 << 16)))
  }

  test("uniform covers the key space roughly evenly") {
    val keys = StreamGen.uniform(100000, 1000, seed = 3)
    val buckets = keys.groupBy(_ / 100).view.mapValues(_.length).toMap
    assert(buckets.size == 10)
    buckets.values.foreach(n => assert(n > 8000 && n < 12000, s"bucket=$n"))
  }

  test("gaussian concentrates around mu") {
    val ks = 1 << 20
    val keys = StreamGen.gaussian(50000, 0.5, 0.125, ks)
    val mean = keys.map(_.toLong).sum.toDouble / keys.length / ks
    assert(math.abs(mean - 0.5) < 0.01, s"mean=$mean")
    val within1Sigma = keys.count(k => math.abs(k.toDouble / ks - 0.5) <= 0.125).toDouble / keys.length
    assert(within1Sigma > 0.6 && within1Sigma < 0.75, s"within=$within1Sigma")
  }

  test("gamma(1, theta) is right-skewed") {
    val ks = 1 << 20
    val keys = StreamGen.gamma(50000, 1, 5.0, ks)
    val mean = keys.map(_.toLong).sum.toDouble / keys.length
    val median = keys.sorted.apply(keys.length / 2).toDouble
    assert(mean > median, s"mean=$mean median=$median")
  }

  test("gamma(3, 3) has more central mass than gamma(1, 5)") {
    val ks = 1 << 20
    val g3 = StreamGen.gamma(50000, 3, 3.0, ks)
    val g1 = StreamGen.gamma(50000, 1, 5.0, ks)
    // exponential (k=1) puts far more mass in the lowest decile
    def lowDecile(a: Array[Int]) = a.count(_ < ks / 10).toDouble / a.length
    assert(lowDecile(g1) > lowDecile(g3))
  }

  test("shifting gaussian moves its mean between phases") {
    val ks = 1 << 20
    // r = 0.2 keeps the target mean (0.7) far enough from the mod-1 wrap
    // that the wrap bias stays below the tolerance
    val keys = StreamGen.shiftingGaussian(10000, 10000, 10000, r = 0.2, keySpace = ks)
    def phaseMean(from: Int, until: Int) =
      keys.slice(from, until).map(_.toLong).sum.toDouble / (until - from) / ks
    assert(math.abs(phaseMean(0, 10000) - 0.5) < 0.02)
    assert(math.abs(phaseMean(20000, 30000) - 0.7) < 0.02)
    val mid = phaseMean(14000, 16000)
    assert(mid > 0.54 && mid < 0.66, s"mid-phase mean=$mid")
  }

  test("shifting gaussian with r=0 is stationary") {
    val keys = StreamGen.shiftingGaussian(1000, 1000, 1000, r = 0.0)
    val ks = StreamGen.DefaultKeySpace
    def phaseMean(from: Int, until: Int) =
      keys.slice(from, until).map(_.toLong).sum.toDouble / (until - from) / ks
    assert(math.abs(phaseMean(0, 1000) - phaseMean(2000, 3000)) < 0.03)
  }

  test("diffForMatchRate yields the requested expected match count") {
    val w    = 1 << 16
    val diff = StreamGen.diffForMatchRate(w, 2.0)
    val ks   = StreamGen.DefaultKeySpace
    val expected = w.toDouble * (2.0 * diff + 1) / ks
    assert(math.abs(expected - 2.0) < 0.1, s"expected=$expected (diff=$diff)")
  }

  test("diffForMatchRate is monotone in sigma and anti-monotone in w") {
    assert(StreamGen.diffForMatchRate(1 << 14, 4.0) > StreamGen.diffForMatchRate(1 << 14, 2.0))
    assert(StreamGen.diffForMatchRate(1 << 14, 2.0) > StreamGen.diffForMatchRate(1 << 18, 2.0))
  }

  test("twoWay alternates streams evenly") {
    val wl = StreamGen.twoWay(Array(1, 2, 3), Array(10, 20, 30))
    assert(wl.length == 6)
    assert(wl.fromR.toSeq == Seq(true, false, true, false, true, false))
    assert(wl.keys.toSeq == Seq(1, 10, 2, 20, 3, 30))
  }

  test("twoWay handles unequal lengths") {
    val wl = StreamGen.twoWay(Array(1), Array(10, 20, 30))
    assert(wl.length == 4)
    assert(wl.fromR.count(identity) == 1)
    assert(wl.keys.toSet == Set(1, 10, 20, 30))
  }

  test("ratio interleaving keeps the requested arrival proportions") {
    val wl = StreamGen.ratio(Array.fill(4000)(1), Array.fill(1000)(2), 4, 1)
    assert(wl.length == 5000)
    // in any prefix, R count stays within one step of 4x S count
    var r = 0; var s = 0
    wl.fromR.foreach { isR =>
      if (isR) r += 1 else s += 1
      assert(math.abs(r - 4 * s) <= 4, s"r=$r s=$s")
    }
  }

  test("selfJoin marks every arrival as stream R") {
    val wl = StreamGen.selfJoin(Array(1, 2, 3))
    assert(wl.fromR.forall(identity))
    assert(wl.keys.toSeq == Seq(1, 2, 3))
  }
}
