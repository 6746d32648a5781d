package repro

import repro.StreamGen.Workload

/** Brute-force reference implementations for the window band join —
  * O(n·w), test-sized inputs only.
  */
object TestRefs {

  /** Per-arrival result groups in arrival order; within a group pairs are
    * sorted by the opposite-stream seq (the canonical order used when
    * comparing differently-ordered implementations).
    */
  def referenceGroups(wl: Workload, wR: Int, wS: Int, diff: Int,
                      selfJoin: Boolean = false): Vector[Vector[(Int, Int)]] = {
    val n     = wl.length
    var rKeys = Vector.empty[Int]
    var sKeys = Vector.empty[Int]
    val out   = Vector.newBuilder[Vector[(Int, Int)]]
    var i = 0
    while (i < n) {
      val isR = selfJoin || wl.fromR(i)
      val k   = wl.keys(i)
      val (oppKeys, oppW) =
        if (selfJoin) (rKeys, wR) else if (isR) (sKeys, wS) else (rKeys, wR)
      val from  = math.max(0, oppKeys.length - oppW)
      val seq   = if (isR) rKeys.length else sKeys.length
      val group = Vector.newBuilder[(Int, Int)]
      var j = from
      while (j < oppKeys.length) {
        if (math.abs(oppKeys(j).toLong - k) <= diff)
          group += (if (isR) (seq, j) else (j, seq))
        j += 1
      }
      out += group.result()
      if (isR) rKeys = rKeys :+ k else sKeys = sKeys :+ k
      i += 1
    }
    out.result()
  }

  /** All result pairs, canonically ordered (arrival order, opposite seq
    * ascending within an arrival).
    */
  def referencePairs(wl: Workload, wR: Int, wS: Int, diff: Int,
                     selfJoin: Boolean = false): Vector[(Int, Int)] =
    referenceGroups(wl, wR, wS, diff, selfJoin).flatten

  /** Chunk a flat pair sequence by the reference group sizes and sort
    * within each chunk — order-preservation checks compare these.
    */
  def normalizeByGroups(pairs: Seq[(Int, Int)],
                        groups: Vector[Vector[(Int, Int)]]): Vector[Vector[(Int, Int)]] = {
    val it  = pairs.iterator
    val out = Vector.newBuilder[Vector[(Int, Int)]]
    groups.foreach { g =>
      out += (0 until g.length).map(_ => it.next()).toVector.sorted
    }
    require(!it.hasNext, "more pairs than the reference expects")
    out.result()
  }
}
