package repro.jobs

import repro.experiments.{Experiments, TablePrinter}
import repro.graph.Datasets

/** spark-submit entrypoints, one per reproduced table (DESIGN.md maps each
  * to its paper source). They print the same tables as the bench suites;
  * the benches additionally assert the paper's qualitative shapes.
  */

/** Table 2 (paper Table II): dataset statistics. */
object DatasetStatsJob {
  def main(args: Array[String]): Unit = {
    val stats = Datasets.all.map(Datasets.stats)
    TablePrinter.print(
      "Table 2 (paper Table II): dataset statistics",
      Seq("graph", "|E|", "|L|", "|R|", "|B|", "density"),
      stats.map(s => Seq(s.name, s.edges.toString, s.left.toString,
        s.right.toString, s.butterflies.toString, TablePrinter.sci(s.density))))
  }
}

/** Table 3 (paper Fig. 3): relative error with 20% deletions. */
object AccuracyDeletionsJob {
  def main(args: Array[String]): Unit = {
    val rows = Datasets.all.flatMap(d =>
      Experiments.accuracy(Seq(d), d.sampleSizes, alpha = 0.2, trials = 5))
    TablePrinter.print(
      "Table 3 (paper Fig. 3): relative error, alpha=20%",
      Seq("dataset", "k", "algorithm", "rel-error"),
      rows.map(r => Seq(r.dataset, r.k.toString, r.algorithm,
        TablePrinter.pct(r.relError))))
  }
}

/** Table 4 (paper Fig. 4): throughput with 20% deletions. */
object ThroughputJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("throughput")
    try {
      val rows = Datasets.all.flatMap(d =>
        Experiments.throughputAll(spark, Seq(d), d.sampleSizes, alpha = 0.2,
          miniBatch = 10000, partitions = 16))
      TablePrinter.print(
        "Table 4 (paper Fig. 4): throughput, alpha=20%",
        Seq("dataset", "k", "algorithm", "edges/s"),
        rows.map(r => Seq(r.dataset, r.k.toString, r.algorithm,
          TablePrinter.sci(r.edgesPerSec))))
    } finally spark.stop()
  }
}

/** Table 5 (paper Fig. 5): relative error on insert-only streams. */
object AccuracyInsertOnlyJob {
  def main(args: Array[String]): Unit = {
    val rows = Datasets.all.flatMap(d =>
      Experiments.accuracy(Seq(d), d.sampleSizes, alpha = 0.0, trials = 5))
    TablePrinter.print(
      "Table 5 (paper Fig. 5): relative error, alpha=0%",
      Seq("dataset", "k", "algorithm", "rel-error"),
      rows.map(r => Seq(r.dataset, r.k.toString, r.algorithm,
        TablePrinter.pct(r.relError))))
  }
}

/** Table 6 (paper Fig. 6): impact of the deletion ratio. */
object DeletionImpactJob {
  def main(args: Array[String]): Unit = {
    val rows = Datasets.all.flatMap(d =>
      Experiments.deletionImpact(Seq(d), Seq(0.05, 0.10, 0.20, 0.30),
        k = d.m / 50, trials = 3))
    TablePrinter.print(
      "Table 6 (paper Fig. 6): ABACUS vs deletion ratio",
      Seq("dataset", "alpha", "rel-error", "edges/s"),
      rows.map(r => Seq(r.dataset, TablePrinter.pct(r.alpha),
        TablePrinter.pct(r.relError), TablePrinter.sci(r.edgesPerSec))))
  }
}

/** Table 7 (paper Fig. 7): elapsed time vs stream prefix. */
object ScalabilityJob {
  def main(args: Array[String]): Unit = {
    val rows = Seq(Datasets.trackersLite, Datasets.orkutLite).flatMap(d =>
      Experiments.scalability(Seq(d), d.sampleSizes, alpha = 0.2))
    TablePrinter.print(
      "Table 7 (paper Fig. 7): cumulative elapsed time [ms]",
      Seq("dataset", "k", "prefix%", "elapsed-ms"),
      rows.map(r => Seq(r.dataset, r.k.toString, r.fractionPct.toString,
        TablePrinter.dbl(r.elapsedMs))))
  }
}

/** Table 8 (paper Fig. 8): PARABACUS speedup vs mini-batch size. */
object SpeedupMinibatchJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("speedup-minibatch")
    try {
      val rows = Datasets.all.flatMap(d =>
        Experiments.speedup(spark, Seq(d), d.speedupSampleSizes,
          miniBatches = Seq(500, 2000, 10000), partitionCounts = Seq(16),
          alpha = 0.2))
      TablePrinter.print(
        "Table 8 (paper Fig. 8): speedup vs mini-batch size, p=16",
        Seq("dataset", "k", "M", "seq-ms", "par-ms", "speedup"),
        rows.map(r => Seq(r.dataset, r.k.toString, r.miniBatch.toString,
          TablePrinter.dbl(r.seqMs), TablePrinter.dbl(r.parMs),
          TablePrinter.dbl(r.speedup))))
    } finally spark.stop()
  }
}

/** Table 9 (paper Fig. 9): PARABACUS speedup vs partition count. */
object SpeedupThreadsJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("speedup-threads")
    try {
      val rows = Datasets.all.flatMap(d =>
        Experiments.speedup(spark, Seq(d), d.speedupSampleSizes,
          miniBatches = Seq(10000), partitionCounts = Seq(1, 2, 4, 8, 16),
          alpha = 0.2))
      TablePrinter.print(
        "Table 9 (paper Fig. 9): speedup vs partitions, M=10000",
        Seq("dataset", "k", "p", "seq-ms", "par-ms", "speedup"),
        rows.map(r => Seq(r.dataset, r.k.toString, r.partitions.toString,
          TablePrinter.dbl(r.seqMs), TablePrinter.dbl(r.parMs),
          TablePrinter.dbl(r.speedup))))
    } finally spark.stop()
  }
}

/** Table 10 (paper Fig. 10): per-partition workload. */
object LoadBalanceJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("load-balance")
    try {
      val rows = Seq(Datasets.movielensLite, Datasets.orkutLite).flatMap(d =>
        Experiments.loadBalance(spark, Seq(d), k = d.m / 10, miniBatch = 10000,
          partitions = 16, alpha = 0.2))
      TablePrinter.print(
        "Table 10 (paper Fig. 10): checks per partition, M=10000, p=16",
        Seq("dataset", "partition", "checks", "edges"),
        rows.map(r => Seq(r.dataset, r.partition.toString, r.work.toString,
          r.edges.toString)))
    } finally spark.stop()
  }
}
