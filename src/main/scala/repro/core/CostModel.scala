package repro.core

/** The paper's analytical per-tuple cost model (Section 2, Equations 1–6).
  *
  * Costs are in abstract node-operation units; the model is used the way
  * the paper uses it — to compare the *shape* of the alternatives (which
  * index wins, how costs move with w, L, P, m, D_I), not to predict
  * wall-clock times.
  */
object CostModel {

  /** Model parameters (notation table, Section 2).
    *
    * @param w          sliding-window size
    * @param sigmaS     match rate (w × selectivity)
    * @param tauC       cost of comparing two tuples
    * @param fb         inner-node fan-out of the classic B+-Tree
    * @param fib        inner-node fan-out of the immutable B+-Tree
    * @param lambdaBs   per-node search cost, classic B+-Tree
    * @param lambdaBi   per-node insert cost, classic B+-Tree
    * @param lambdaBd   per-node delete cost, classic B+-Tree
    * @param lambdaIbs  per-node search cost, immutable B+-Tree
    * @param mergePerElem per-element cost of the linear merge (Fig. 14)
    */
  final case class Params(
      w: Double,
      sigmaS: Double = 2.0,
      tauC: Double = 1.0,
      fb: Double = 16,
      fib: Double = 32,
      lambdaBs: Double = 1.0,
      lambdaBi: Double = 1.2,
      lambdaBd: Double = 1.2,
      lambdaIbs: Double = 0.8,
      mergePerElem: Double = 0.5,
  ) {
    require(w >= 2)
    /** H_b ≈ log_fb(w) */
    def heightB(n: Double): Double = math.max(1.0, math.log(math.max(2, n)) / math.log(fb))
    /** H_S ≈ log_fib(n) */
    def heightIb(n: Double): Double = math.max(1.0, math.log(math.max(2, n)) / math.log(fib))
  }

  /** Equation 2 — IBWJ with a single B+-Tree. */
  def cBJ(p: Params): Double = {
    val hb = p.heightB(p.w)
    hb * p.lambdaBs + p.sigmaS * p.tauC + hb * p.lambdaBd + hb * p.lambdaBi
  }

  /** Equation 3 — IBWJ with a chained index of length L (L > 2 per paper;
    * we accept L >= 2).
    */
  def cCJ(p: Params, L: Int): Double = {
    require(L >= 2)
    val hc = math.max(1.0, p.heightB(p.w) - math.log(L) / math.log(p.fb))
    L * hc * p.lambdaBs +
      p.sigmaS * p.tauC * (1.0 + 1.0 / (2.0 * (L - 1))) +
      hc * p.lambdaBi
  }

  /** Equation 4 — IBWJ with round-robin partitioning over P join-cores. */
  def cRRJ(p: Params, P: Int): Double = {
    require(P >= 1)
    val hp = math.max(1.0, p.heightB(p.w) - math.log(P) / math.log(p.fb))
    P * hp * p.lambdaBs + p.sigmaS * p.tauC + hp * p.lambdaBd + hp * p.lambdaBi
  }

  /** Equation 5 — IBWJ with the IM-Tree, merge ratio m. The average
    * mutable-component population is m·w/2.
    */
  def cMJ(p: Params, m: Double): Double = {
    require(m > 0 && m <= 1)
    val hS = p.heightIb(p.w)
    val hI = p.heightB(math.max(2, m * p.w / 2))
    val mergeAmortized = p.mergePerElem * (1 + m) / m // M/(m·w), M ≈ c·(1+m)·w
    hS * p.lambdaIbs + hI * p.lambdaBs +
      p.sigmaS * p.tauC * (1 + m / 2) +
      mergeAmortized +
      hI * p.lambdaBi
  }

  /** Equation 6 — IBWJ with the PIM-Tree, merge ratio m, insertion depth
    * dI (≈ f_ib^dI subindexes).
    */
  def cPJ(p: Params, m: Double, dI: Int): Double = {
    require(m > 0 && m <= 1)
    require(dI >= 1)
    val partitions = math.pow(p.fib, dI.toDouble)
    val hS  = p.heightIb(p.w)
    val hI  = p.heightB(math.max(2, m * p.w / 2 / partitions))
    val mergeAmortized = p.mergePerElem * (1 + m) / m
    hS * p.lambdaIbs + hI * p.lambdaBs +
      p.sigmaS * p.tauC * (1 + m / 2) +
      mergeAmortized +
      dI * p.lambdaIbs + hI * p.lambdaBi
  }
}
