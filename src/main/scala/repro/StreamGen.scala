package repro

import scala.util.Random

/** Deterministic generators for the paper's streaming workloads
  * (Section 5): integer join keys under uniform, Gaussian, Gamma and
  * shifting-Gaussian distributions, plus arrival interleavings for
  * two-way, self- and asymmetric-rate joins.
  *
  * The paper draws keys in [0, 1] and scales; we draw directly into an
  * integer key space `keySpace` (exclusive upper bound). All generators
  * are pure functions of their arguments including `seed`.
  */
object StreamGen {

  /** Default integer key space (2^26 — large enough that the band width
    * `diff` for match rate 2 stays >= 1 up to w = 2^27).
    */
  val DefaultKeySpace: Int = 1 << 26

  /** Band half-width `diff` for which the expected match rate against a
    * window of w uniform keys is sigmaS:  w·(2·diff+1)/keySpace = sigmaS.
    */
  def diffForMatchRate(w: Int, sigmaS: Double, keySpace: Int = DefaultKeySpace): Int =
    math.max(0, math.round((sigmaS * keySpace / w - 1) / 2).toInt)

  @inline private def clampKey(v: Double, keySpace: Int): Int =
    math.min(keySpace - 1, math.max(0, v)).toInt

  def uniform(n: Int, keySpace: Int = DefaultKeySpace, seed: Long = 7): Array[Int] = {
    val rnd = new Random(seed)
    Array.fill(n)(rnd.nextInt(keySpace))
  }

  /** Gaussian with mean/sigma expressed as fractions of the key space
    * (the paper uses mu = 0.5, sigma = 0.125 on [0, 1]).
    */
  def gaussian(n: Int, mu: Double = 0.5, sigma: Double = 0.125,
               keySpace: Int = DefaultKeySpace, seed: Long = 11): Array[Int] = {
    val rnd = new Random(seed)
    Array.fill(n)(clampKey((rnd.nextGaussian() * sigma + mu) * keySpace, keySpace))
  }

  /** Gamma(k, theta) scaled so that the bulk of the mass (~k·theta·2.5)
    * covers the key space — paper uses (k=3, theta=3) and (k=1, theta=5).
    * Tail values beyond the key space are redrawn (clamping them instead
    * piles several percent of the stream onto one key and corrupts the
    * match rate).
    */
  def gamma(n: Int, k: Int, theta: Double,
            keySpace: Int = DefaultKeySpace, seed: Long = 13): Array[Int] = {
    require(k >= 1)
    val rnd   = new Random(seed)
    val scale = keySpace / (k * theta * 2.5)
    Array.fill(n) {
      var key = keySpace.toDouble
      while (key >= keySpace) {
        // sum of k exponentials
        var s = 0.0
        var i = 0
        while (i < k) { s += -math.log(1.0 - rnd.nextDouble()) * theta; i += 1 }
        key = s * scale
      }
      key.toInt
    }
  }

  /** The three-phase shifting Gaussian of Section 5 (Fig. 13): fixed at
    * N(0.5, 0.125), then the mean drifts linearly to 0.5 + r (values
    * taken modulo 1 so the stream stays inside the key space), then fixed
    * again.
    */
  def shiftingGaussian(nPhase1: Int, nPhase2: Int, nPhase3: Int, r: Double,
                       sigma: Double = 0.125, keySpace: Int = DefaultKeySpace,
                       seed: Long = 17): Array[Int] = {
    val rnd = new Random(seed)
    val out = new Array[Int](nPhase1 + nPhase2 + nPhase3)
    var i   = 0
    while (i < out.length) {
      val mu =
        if (i < nPhase1) 0.5
        else if (i < nPhase1 + nPhase2) 0.5 + r * (i - nPhase1).toDouble / math.max(1, nPhase2)
        else 0.5 + r
      val v = (rnd.nextGaussian() * sigma + mu) % 1.0
      out(i) = clampKey((if (v < 0) v + 1.0 else v) * keySpace, keySpace)
      i += 1
    }
    out
  }

  /** An interleaved two-stream arrival sequence.
    *
    * @param fromR  fromR(i) is true iff the i-th arrival belongs to stream R
    * @param keys   keys(i) is the i-th arrival's join key
    */
  final case class Workload(fromR: Array[Boolean], keys: Array[Int]) {
    def length: Int = keys.length
  }

  /** Symmetric alternating arrivals R, S, R, S, … */
  def twoWay(rKeys: Array[Int], sKeys: Array[Int]): Workload = {
    val n     = rKeys.length + sKeys.length
    val fromR = new Array[Boolean](n)
    val keys  = new Array[Int](n)
    var r = 0; var s = 0; var i = 0
    while (i < n) {
      val takeR = s >= sKeys.length || (r < rKeys.length && (r <= s))
      if (takeR) { fromR(i) = true; keys(i) = rKeys(r); r += 1 }
      else { keys(i) = sKeys(s); s += 1 }
      i += 1
    }
    Workload(fromR, keys)
  }

  /** Rate-skewed interleaving (Fig. 11b): for every `rPer` R-arrivals
    * there are `sPer` S-arrivals, evenly interleaved.
    */
  def ratio(rKeys: Array[Int], sKeys: Array[Int], rPer: Int, sPer: Int): Workload = {
    require(rPer >= 1 && sPer >= 1)
    val n     = rKeys.length + sKeys.length
    val fromR = new Array[Boolean](n)
    val keys  = new Array[Int](n)
    var r = 0; var s = 0; var i = 0
    while (i < n) {
      // pick the stream that is behind its target share
      val takeR =
        s >= sKeys.length ||
          (r < rKeys.length && r.toLong * sPer <= s.toLong * rPer)
      if (takeR) { fromR(i) = true; keys(i) = rKeys(r); r += 1 }
      else { keys(i) = sKeys(s); s += 1 }
      i += 1
    }
    Workload(fromR, keys)
  }

  /** Self-join arrival sequence: one stream, every arrival probes the
    * window of its own stream (Fig. 12c).
    */
  def selfJoin(keys: Array[Int]): Workload =
    Workload(Array.fill(keys.length)(true), keys)
}
