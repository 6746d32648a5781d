package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.StreamGen
import repro.stream.SparkBandJoin

/** spark-submit entrypoint: the paper's band-join query as a Catalyst
  * DataFrame job over a generated workload, with windowed semantics.
  *
  * Usage: BandJoinJob [logW] [nTuples]
  */
object BandJoinJob {
  def main(args: Array[String]): Unit = {
    val logW = args.headOption.map(_.toInt).getOrElse(12)
    val n    = args.lift(1).map(_.toInt).getOrElse(50000)
    val w    = 1 << logW
    val diff = StreamGen.diffForMatchRate(w, 2.0)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-band-join")
      .getOrCreate()
    try {
      val wl = StreamGen.twoWay(
        StreamGen.uniform(n / 2, seed = 7),
        StreamGen.uniform(n - n / 2, seed = 107))
      val (r, s) = SparkBandJoin.toDataFrames(spark, wl)
      val t0  = System.nanoTime()
      val cnt = SparkBandJoin.windowedBandJoin(spark, r, s, w, w, diff).count()
      val dt  = (System.nanoTime() - t0) / 1e9
      println(f"windowed band join: w=2^$logW n=$n diff=$diff -> $cnt results in $dt%.1fs")
    } finally spark.stop()
  }
}
