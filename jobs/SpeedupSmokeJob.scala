package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.{Abacus, ParAbacus}
import repro.experiments.Metrics
import repro.graph.Datasets

/** Development smoke test for PARABACUS: verifies Abacus/ParAbacus estimate
  * equality and prints speedup for a few mini-batch sizes.
  *
  * Run: `sbt "runMain repro.jobs.SpeedupSmokeJob"`
  */
object SpeedupSmokeJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master("local[*]").appName("speedup-smoke")
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    val d = Datasets.movielensLite
    val k = 16000
    val stream = d.stream(0.2)
    val seed = 33L

    // warmup
    new Abacus(k, seed).processAll(stream.take(20000))
    new ParAbacus(k, seed, spark, 16).processAll(stream.take(20000), 2000)

    val seq = new Abacus(k, seed)
    val (_, seqNs) = Metrics.timed(seq.processAll(stream))
    println(f"sequential: ${seqNs / 1e6}%.0f ms est=${seq.estimate}%.6e")

    for (m <- Seq(500, 2000, 10000); p <- Seq(16)) {
      val pa = new ParAbacus(k, seed, spark, p)
      val (_, parNs) = Metrics.timed(pa.processAll(stream, m))
      val diff = math.abs(pa.estimate - seq.estimate) / math.abs(seq.estimate)
      println(f"parabacus M=$m%-6d p=$p%-3d ${parNs / 1e6}%.0f ms " +
        f"speedup=${seqNs.toDouble / parNs}%.2f relDiffVsSeq=$diff%.2e")
    }
    spark.stop()
  }
}
