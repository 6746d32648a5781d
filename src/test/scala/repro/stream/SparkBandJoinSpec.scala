package repro.stream

import repro.{Oracle, SparkSpec, StreamGen, TestRefs}

class SparkBandJoinSpec extends SparkSpec {

  private def workload(n: Int, keySpace: Int, seed: Long) =
    StreamGen.twoWay(StreamGen.uniform(n / 2, keySpace, seed),
                     StreamGen.uniform(n - n / 2, keySpace, seed + 50))

  test("plain band join matches DuckDB") {
    import spark.implicits._
    val r = StreamGen.uniform(400, 1 << 10, 1).zipWithIndex.map { case (x, i) => (i, x) }
      .toSeq.toDF("rid", "rx")
    val s = StreamGen.uniform(400, 1 << 10, 2).zipWithIndex.map { case (x, i) => (i, x) }
      .toSeq.toDF("sid", "sx")
    val joined = SparkBandJoin.bandJoin(r, s, 10)
    Oracle.assertEquivalent(
      joined,
      "SELECT r.rid AS rid, s.sid AS sid FROM r, s " +
        "WHERE ABS(CAST(r.rx AS BIGINT) - CAST(s.sx AS BIGINT)) <= 10",
      "r" -> r, "s" -> s)
  }

  for ((w, diff) <- Seq((32, 20), (128, 8))) {
    test(s"windowed band join matches DuckDB (w=$w, diff=$diff)") {
      val wl     = workload(600, 1 << 10, w + diff)
      val (r, s) = SparkBandJoin.toDataFrames(spark, wl)
      val joined = SparkBandJoin.windowedBandJoin(spark, r, s, w, w, diff)
      Oracle.assertEquivalent(joined, SparkBandJoin.windowedBandJoinSql(w, w, diff),
                              "r" -> r, "s" -> s)
    }
  }

  test("windowed band join equals the brute-force reference") {
    val w    = 64
    val diff = 12
    val wl   = workload(800, 1 << 10, 9)
    val (r, s) = SparkBandJoin.toDataFrames(spark, wl)
    val got = SparkBandJoin.windowedBandJoin(spark, r, s, w, w, diff)
      .collect().map(row => (row.getInt(0), row.getInt(1))).sorted.toVector
    val ref = TestRefs.referencePairs(wl, w, w, diff).sorted
    assert(got == ref)
  }

  test("windowed band join with asymmetric windows matches DuckDB") {
    val (wR, wS) = (16, 128)
    val diff     = 10
    val wl       = workload(500, 1 << 10, 3)
    val (r, s)   = SparkBandJoin.toDataFrames(spark, wl)
    val joined   = SparkBandJoin.windowedBandJoin(spark, r, s, wR, wS, diff)
    Oracle.assertEquivalent(joined, SparkBandJoin.windowedBandJoinSql(wR, wS, diff),
                            "r" -> r, "s" -> s)
  }

  test("toDataFrames annotates arrivals consistently") {
    val wl = workload(100, 64, 4)
    val (r, s) = SparkBandJoin.toDataFrames(spark, wl)
    assert(r.count() + s.count() == wl.length)
    // global sequence numbers are unique across the two relations
    val gs = r.select("rgseq").collect().map(_.getInt(0)) ++
      s.select("sgseq").collect().map(_.getInt(0))
    assert(gs.sorted.toSeq == (0 until wl.length))
    // opposite-head column never exceeds the opposite count so far
    val rRows = r.collect().map(x => (x.getInt(2), x.getInt(3)))
    rRows.foreach { case (g, h) => assert(h < wl.length && h >= -1 && h < g) }
  }
}
