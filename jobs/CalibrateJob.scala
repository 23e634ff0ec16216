package repro.jobs

import repro.core.Abacus
import repro.experiments.Metrics
import repro.graph.Datasets

/** Development calibration entrypoint (not tied to a paper table): prints
  * the measured statistics of every dataset analog and rough ABACUS
  * timings, so generator and sample-size parameters can be tuned.
  *
  * Run: `sbt "runMain repro.jobs.CalibrateJob"`
  */
object CalibrateJob {
  def main(args: Array[String]): Unit = {
    Datasets.all.foreach { d =>
      val (s, ns) = Metrics.timed(Datasets.stats(d))
      println(f"${s.name}%-18s |E|=${s.edges}%-7d |L|=${s.left}%-6d |R|=${s.right}%-6d " +
        f"|B|=${s.butterflies}%-12d density=${s.density}%.3e statsMs=${ns / 1e6}%.0f")
    }
    for (d <- Datasets.all; alpha <- Seq(0.2)) {
      val (truth, tNs) = Metrics.timed(d.exactFinalCount(alpha))
      val stream = d.stream(alpha)
      for (k <- d.sampleSizes ++ d.speedupSampleSizes) {
        val a = new Abacus(k, 1L)
        val (_, ns) = Metrics.timed(a.processAll(stream))
        println(f"${d.name}%-18s alpha=$alpha k=$k%-5d exact=$truth%-12d exactMs=${tNs / 1e6}%.0f " +
          f"est=${a.estimate}%.3e relErr=${Metrics.relativeError(truth.toDouble, a.estimate)}%.4f " +
          f"abacusMs=${ns / 1e6}%.0f thr=${Metrics.throughput(stream.size.toLong, ns)}%.2e work=${a.totalWork}")
      }
    }
  }
}
