package repro.core

import org.scalatest.funsuite.AnyFunSuite

import CostModel._

/** Asserts the paper's qualitative analytical claims (Section 2/3). */
class CostModelSpec extends AnyFunSuite {

  private val wSweep = Seq(1 << 14, 1 << 17, 1 << 20, 1 << 23).map(_.toDouble)

  test("all costs are positive and finite") {
    wSweep.foreach { w =>
      val p = Params(w)
      Seq(cBJ(p), cCJ(p, 4), cRRJ(p, 8), cMJ(p, 0.125), cPJ(p, 0.125, 2))
        .foreach(c => assert(c > 0 && java.lang.Double.isFinite(c)))
    }
  }

  test("chained-index search cost grows with chain length (Sec 2.2.2)") {
    wSweep.foreach { w =>
      val p = Params(w)
      val costs = Seq(2, 4, 8, 16, 32).map(cCJ(p, _))
      assert(costs == costs.sorted, s"w=$w costs=$costs")
    }
  }

  test("round-robin search cost grows with join-core count (Sec 2.2.3)") {
    wSweep.foreach { w =>
      val p = Params(w)
      val costs = Seq(1, 2, 4, 8, 16).map(cRRJ(p, _))
      assert(costs.drop(1) == costs.drop(1).sorted, s"w=$w costs=$costs")
      // P=1 equals the plain B+-Tree join
      assert(math.abs(cRRJ(p, 1) - cBJ(p)) < 1e-9)
    }
  }

  test("merge-tree cost is U-shaped in the merge ratio (Fig 9c/9d shape)") {
    wSweep.foreach { w =>
      val p     = Params(w)
      val ms    = Seq(1.0 / 64, 1.0 / 16, 1.0 / 8, 1.0 / 2, 1.0)
      val costs = ms.map(cMJ(p, _))
      val minIdx = costs.indexOf(costs.min)
      assert(minIdx > 0 && minIdx < costs.size - 1,
        s"w=$w expected interior optimum, costs=$costs")
    }
  }

  test("PIM-Tree beats IM-Tree at equal m for large mutable components") {
    // partitioned subindexes are shallower, so insert+search of T_I is
    // cheaper once |T_I| is large (Sec 3.3.2)
    val p = Params(1 << 23)
    assert(cPJ(p, 1.0, 2) < cMJ(p, 1.0))
  }

  test("PIM-Tree routing overhead can lose at tiny mutable components") {
    // with a near-empty T_I the extra D_I traversal dominates
    val p  = Params(1 << 14)
    val m  = 1.0 / 64
    assert(cPJ(p, m, 3) >= cMJ(p, m) - 1e-9)
  }

  test("merge-tree join beats B+-Tree join at the tuned merge ratio (Fig 10a)") {
    wSweep.foreach { w =>
      val p = Params(w)
      assert(cMJ(p, 1.0 / 4) < cBJ(p), s"w=$w")
      assert(cPJ(p, 1.0 / 4, 2) < cBJ(p), s"w=$w")
    }
  }

  test("costs increase with window size for every algorithm") {
    def mono(f: Params => Double): Unit = {
      val costs = wSweep.map(w => f(Params(w)))
      assert(costs == costs.sorted, costs.toString)
    }
    mono(cBJ)
    mono(cCJ(_, 4))
    mono(cRRJ(_, 8))
    mono(cMJ(_, 0.125))
    mono(cPJ(_, 0.125, 2))
  }

  test("higher match rate raises every cost linearly in sigma_s") {
    val w = 1 << 20
    Seq[Params => Double](cBJ, cCJ(_, 4), cRRJ(_, 8), cMJ(_, 0.125), cPJ(_, 0.125, 2))
      .foreach { f =>
        val lo = f(Params(w, sigmaS = 1))
        val hi = f(Params(w, sigmaS = 1024))
        assert(hi > lo)
      }
  }

  test("immutable fan-out reduces T_S height (Sec 3.1)") {
    val p = Params(1 << 20, fb = 16, fib = 64)
    assert(p.heightIb(1 << 20) < p.heightB(1 << 20))
  }

  test("parameter validation") {
    intercept[IllegalArgumentException](Params(1))
    intercept[IllegalArgumentException](cCJ(Params(1024), 1))
    intercept[IllegalArgumentException](cMJ(Params(1024), 0))
    intercept[IllegalArgumentException](cMJ(Params(1024), 1.5))
    intercept[IllegalArgumentException](cPJ(Params(1024), 0.5, 0))
  }
}
