package repro.stream

import java.util.concurrent.ConcurrentHashMap

import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream

import repro.StreamGen.Workload
import repro.core.{Elem, LongVec}
import repro.index.PIMTree

/** The calibration target: the partitioned in-memory merge-tree join run
  * per-partition inside `mapPartitions`-style Dataset operations within
  * micro-batches.
  *
  * Keys are range-partitioned into `numPartitions` disjoint intervals
  * (content-sensitive, like PIM-Tree's own partitioning — not round-
  * robin). Each partition owns a [[PartitionJoiner]]: a pair of PIM-Trees
  * plus window bookkeeping, held in an executor-JVM singleton registry
  * (valid under `local[*]` where driver and executors share one JVM —
  * stated in DESIGN.md). Per batch, every tuple is routed to its *home*
  * partition (which indexes it) and replicated to the partitions whose
  * range overlaps [x − diff, x + diff] for lookup, so each result pair is
  * produced exactly once, by the later-arriving tuple.
  *
  * Batches can be driven either directly ([[processBatch]]) or through
  * Structured Streaming micro-batches ([[runStreaming]] via MemoryStream
  * + foreachBatch).
  */
object MicroBatchPimJoin {

  /** One stream arrival: global seq, stream tag, stream-local seq, the
    * opposite stream's latest seq at arrival, and the join key.
    */
  final case class InTuple(gseq: Long, isR: Boolean, sseq: Int, oppHead: Int, x: Int)

  /** A tuple routed to one partition (`home` = this partition indexes it). */
  final case class Routed(part: Int, gseq: Long, isR: Boolean, sseq: Int,
                          oppHead: Int, x: Int, home: Boolean)

  final case class OutPair(rSeq: Int, sSeq: Int)

  final case class Config(
      numPartitions: Int,
      wR: Int,
      wS: Int,
      diff: Int,
      keySpace: Int,
      mergeRatio: Double = 1.0,
      insertionDepth: Int = 2,
      selfJoin: Boolean = false,
  ) {
    val partWidth: Int = math.max(1, (keySpace + numPartitions - 1) / numPartitions)
    def partOf(x: Int): Int = math.min(numPartitions - 1, math.max(0, x) / partWidth)
  }

  /** Single-partition joiner: two PIM-Trees (R and S sides) over the
    * partition's key interval. Single-threaded per partition — Spark's
    * task-per-partition is the unit of parallelism here, so the window is
    * always fully indexed and no edge-tuple machinery is needed.
    */
  final class PartitionJoiner(cfg: Config) {
    private def mkIndex(w: Int) =
      new PIMTree(cfg.insertionDepth,
                  math.max(1, (cfg.mergeRatio * w / cfg.numPartitions).toInt))
    private val indexR = mkIndex(cfg.wR)
    private val indexS = mkIndex(cfg.wS)
    private var headR  = -1 // highest R seq observed (either side)
    private var headS  = -1
    private val out    = new LongVec(64)

    /** Process one batch slice, pre-sorted by gseq. */
    def process(rows: Iterator[Routed]): Iterator[OutPair] = {
      val res = Vector.newBuilder[OutPair]
      rows.foreach { row =>
        val oppIdx  = if (cfg.selfJoin) indexR else if (row.isR) indexS else indexR
        val oppW    = if (cfg.selfJoin) cfg.wR else if (row.isR) cfg.wS else cfg.wR
        if (row.oppHead >= 0) {
          val lo = if (row.x >= cfg.diff) row.x - cfg.diff else 0
          val hi = if (row.x <= Int.MaxValue - cfg.diff) row.x + cfg.diff else Int.MaxValue
          val te = math.max(0, row.oppHead - oppW + 1)
          out.clear()
          oppIdx.rangeSearch(lo, hi, out)
          var j = 0
          while (j < out.size) {
            val ref = Elem.ref(out(j))
            if (ref >= te && ref <= row.oppHead)
              res += (if (row.isR) OutPair(row.sseq, ref) else OutPair(ref, row.sseq))
            j += 1
          }
        }
        // track stream heads from both own arrivals and observed oppHeads
        if (row.isR) {
          if (row.sseq > headR) headR = row.sseq
          if (row.oppHead > headS) headS = row.oppHead
        } else {
          if (row.sseq > headS) headS = row.sseq
          if (row.oppHead > headR) headR = row.oppHead
        }
        if (row.home) {
          val ownIdx = if (cfg.selfJoin || row.isR) indexR else indexS
          ownIdx.insert(row.x, row.sseq)
        }
        indexR.maintain(math.max(0, headR + 1 - cfg.wR))
        indexS.maintain(math.max(0, headS + 1 - cfg.wS))
      }
      res.result().iterator
    }
  }

  /** Executor-JVM singleton state, keyed by (jobId, partition). */
  object Registry {
    private val joiners = new ConcurrentHashMap[(String, Int), PartitionJoiner]
    def joinerFor(jobId: String, part: Int, cfg: Config): PartitionJoiner =
      joiners.computeIfAbsent((jobId, part), _ => new PartitionJoiner(cfg))
    def clear(jobId: String): Unit = {
      val it = joiners.keySet.iterator
      while (it.hasNext) if (it.next()._1 == jobId) it.remove()
    }
  }

  /** Route one arrival: replicate to every partition overlapping its band
    * for lookup; exactly one of those is also its indexing home.
    */
  def route(t: InTuple, cfg: Config): Seq[Routed] = {
    val home = cfg.partOf(t.x)
    val loP  = cfg.partOf(math.max(0, t.x - cfg.diff))
    val hiP  = cfg.partOf(math.min(cfg.keySpace - 1, t.x + cfg.diff))
    (loP to hiP).map(p => Routed(p, t.gseq, t.isR, t.sseq, t.oppHead, t.x, home = p == home))
  }

  /** One micro-batch: route, range-partition by key interval, run the
    * per-partition PIM-Tree join inside the partition's task.
    */
  def processBatch(spark: SparkSession, jobId: String, batch: Dataset[InTuple],
                   cfg: Config): Dataset[OutPair] = {
    import spark.implicits._
    batch
      .flatMap(t => route(t, cfg))
      .groupByKey(_.part)
      .flatMapGroups { (part: Int, rows: Iterator[Routed]) =>
        val sorted = rows.toArray.sortBy(_.gseq)
        Registry.joinerFor(jobId, part, cfg).process(sorted.iterator)
      }
  }

  /** Convert a generated workload into arrival tuples. */
  def toTuples(workload: Workload, selfJoin: Boolean = false): Seq[InTuple] = {
    val n   = workload.length
    val out = Vector.newBuilder[InTuple]
    var r = 0; var s = 0; var i = 0
    while (i < n) {
      if (selfJoin) { out += InTuple(i.toLong, isR = true, r, r - 1, workload.keys(i)); r += 1 }
      else if (workload.fromR(i)) { out += InTuple(i.toLong, isR = true, r, s - 1, workload.keys(i)); r += 1 }
      else { out += InTuple(i.toLong, isR = false, s, r - 1, workload.keys(i)); s += 1 }
      i += 1
    }
    out.result()
  }

  /** Drive the join through Structured Streaming: a MemoryStream fed in
    * `batchSize` chunks, joined per micro-batch via foreachBatch. Returns
    * all result pairs.
    */
  def runStreaming(spark: SparkSession, jobId: String, tuples: Seq[InTuple],
                   cfg: Config, batchSize: Int): Seq[OutPair] = {
    import spark.implicits._
    implicit val sq: org.apache.spark.sql.SQLContext = spark.sqlContext
    val stream    = MemoryStream[InTuple]
    val collected = new java.util.concurrent.ConcurrentLinkedQueue[OutPair]
    val query = stream
      .toDS()
      .writeStream
      .outputMode("append")
      .foreachBatch { (df: Dataset[InTuple], _: Long) =>
        processBatch(spark, jobId, df, cfg).collect().foreach(collected.add)
        ()
      }
      .start()
    try {
      tuples.grouped(batchSize).foreach { chunk =>
        stream.addData(chunk)
        query.processAllAvailable()
      }
    } finally query.stop()
    Registry.clear(jobId)
    import scala.jdk.CollectionConverters._
    collected.asScala.toSeq
  }

  /** Drive the join as a plain sequence of micro-batch Datasets (the
    * bench path — no streaming engine overhead in the measurement).
    */
  def runBatches(spark: SparkSession, jobId: String, tuples: Seq[InTuple],
                 cfg: Config, batchSize: Int): Seq[OutPair] = {
    import spark.implicits._
    val res = Vector.newBuilder[OutPair]
    tuples.grouped(batchSize).foreach { chunk =>
      res ++= processBatch(spark, jobId, chunk.toDS(), cfg).collect()
    }
    Registry.clear(jobId)
    res.result()
  }
}
