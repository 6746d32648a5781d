package repro.stream

import repro.{Oracle, SparkSpec, StreamGen, TestRefs}
import repro.stream.MicroBatchPimJoin.{Config, InTuple}

class MicroBatchPimJoinSpec extends SparkSpec {

  private def workload(n: Int, keySpace: Int, seed: Long) =
    StreamGen.twoWay(StreamGen.uniform(n / 2, keySpace, seed),
                     StreamGen.uniform(n - n / 2, keySpace, seed + 50))

  test("toTuples mirrors the workload geometry") {
    val wl = workload(200, 1 << 8, 1)
    val ts = MicroBatchPimJoin.toTuples(wl)
    assert(ts.length == wl.length)
    assert(ts.map(_.gseq) == (0 until wl.length).map(_.toLong))
    ts.foreach(t => assert(t.oppHead < t.gseq))
    assert(ts.count(_.isR) == wl.fromR.count(identity))
  }

  test("route replicates to the partitions overlapping the band, one home") {
    val cfg = Config(numPartitions = 8, wR = 16, wS = 16, diff = 40, keySpace = 1 << 10)
    val t   = InTuple(0, isR = true, 0, -1, 128)
    val routed = MicroBatchPimJoin.route(t, cfg)
    assert(routed.count(_.home) == 1)
    assert(routed.map(_.part).distinct.size == routed.size)
    val homeP = cfg.partOf(128)
    assert(routed.find(_.home).get.part == homeP)
    // band [88, 168] spans exactly the partitions covering those keys
    val wanted = (cfg.partOf(88) to cfg.partOf(168)).toSet
    assert(routed.map(_.part).toSet == wanted)
  }

  for (parts <- Seq(1, 2, 4, 8); batchSize <- Seq(256, 1000)) {
    test(s"micro-batch join equals reference (partitions=$parts, batch=$batchSize)") {
      val w    = 64
      val wl   = workload(2000, 1 << 10, parts * 3 + batchSize)
      val diff = 12
      val cfg  = Config(parts, w, w, diff, 1 << 10)
      val tuples = MicroBatchPimJoin.toTuples(wl)
      val got = MicroBatchPimJoin
        .runBatches(spark, s"t-$parts-$batchSize", tuples, cfg, batchSize)
        .map(p => (p.rSeq, p.sSeq)).sorted.toVector
      val ref = TestRefs.referencePairs(wl, w, w, diff).sorted
      assert(got == ref)
    }
  }

  test("micro-batch join with merges equals reference (small merge ratio)") {
    val w    = 64
    val wl   = workload(4000, 1 << 10, 9)
    val diff = 10
    val cfg  = Config(4, w, w, diff, 1 << 10, mergeRatio = 0.25)
    val got = MicroBatchPimJoin
      .runBatches(spark, "t-merge", MicroBatchPimJoin.toTuples(wl), cfg, 512)
      .map(p => (p.rSeq, p.sSeq)).sorted.toVector
    val ref = TestRefs.referencePairs(wl, w, w, diff).sorted
    assert(got == ref)
  }

  test("micro-batch join result matches DuckDB oracle") {
    import spark.implicits._
    val w    = 48
    val wl   = workload(700, 1 << 10, 10)
    val diff = 15
    val cfg  = Config(4, w, w, diff, 1 << 10)
    val pairs = MicroBatchPimJoin
      .runBatches(spark, "t-oracle", MicroBatchPimJoin.toTuples(wl), cfg, 256)
    val got = pairs.map(p => (p.rSeq, p.sSeq)).toDF("rid", "sid")
    val (r, s) = SparkBandJoin.toDataFrames(spark, wl)
    Oracle.assertEquivalent(got, SparkBandJoin.windowedBandJoinSql(w, w, diff),
                            "r" -> r, "s" -> s)
  }

  test("structured-streaming driver (MemoryStream + foreachBatch) equals reference") {
    val w    = 32
    val wl   = workload(1200, 1 << 9, 11)
    val diff = 8
    val cfg  = Config(4, w, w, diff, 1 << 9)
    val got = MicroBatchPimJoin
      .runStreaming(spark, "t-stream", MicroBatchPimJoin.toTuples(wl), cfg, batchSize = 300)
      .map(p => (p.rSeq, p.sSeq)).sorted.toVector
    val ref = TestRefs.referencePairs(wl, w, w, diff).sorted
    assert(got == ref)
  }

  test("asymmetric windows through the micro-batch path") {
    val (wR, wS) = (16, 128)
    val wl   = workload(1500, 1 << 10, 12)
    val diff = 10
    val cfg  = Config(4, wR, wS, diff, 1 << 10)
    val got = MicroBatchPimJoin
      .runBatches(spark, "t-asym", MicroBatchPimJoin.toTuples(wl), cfg, 500)
      .map(p => (p.rSeq, p.sSeq)).sorted.toVector
    val ref = TestRefs.referencePairs(wl, wR, wS, diff).sorted
    assert(got == ref)
  }

  test("self-join through the micro-batch path") {
    val w    = 64
    val keys = StreamGen.uniform(1500, 1 << 10, 13)
    val wl   = StreamGen.selfJoin(keys)
    val diff = 10
    val cfg  = Config(4, w, w, diff, 1 << 10, selfJoin = true)
    val got = MicroBatchPimJoin
      .runBatches(spark, "t-self", MicroBatchPimJoin.toTuples(wl, selfJoin = true), cfg, 400)
      .map(p => (p.rSeq, p.sSeq)).sorted.toVector
    val ref = TestRefs.referencePairs(wl, w, w, diff, selfJoin = true).sorted
    assert(got == ref)
  }

  test("registry isolates jobs and clears state") {
    val cfg = Config(2, 16, 16, 4, 1 << 8)
    val j1  = MicroBatchPimJoin.Registry.joinerFor("job-a", 0, cfg)
    val j2  = MicroBatchPimJoin.Registry.joinerFor("job-b", 0, cfg)
    assert(!(j1 eq j2))
    assert(MicroBatchPimJoin.Registry.joinerFor("job-a", 0, cfg) eq j1)
    MicroBatchPimJoin.Registry.clear("job-a")
    assert(!(MicroBatchPimJoin.Registry.joinerFor("job-a", 0, cfg) eq j1))
  }
}
