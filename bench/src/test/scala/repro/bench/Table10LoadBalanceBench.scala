package repro.bench

import repro.SparkSpec
import repro.experiments.{Experiments, TablePrinter}
import repro.graph.Datasets

/** Table 10 — per-partition workload: set-intersection checks accumulated
  * by each partition over the whole stream (paper Fig. 10: MovieLens vs
  * Orkut, 32 threads, M=10K). Expected shapes: near-uniform work across
  * partitions, and much more work per partition on the densest analog than
  * on the sparsest.
  */
class Table10LoadBalanceBench extends SparkSpec {

  private val datasets = Seq(Datasets.movielensLite, Datasets.orkutLite)
  private val partitions = 16

  test("Table 10: per-partition workload (paper Fig. 10)") {
    val rows = datasets.flatMap { d =>
      // k = |E|/10 mirrors the paper's middle sample size choice (150K).
      Experiments.loadBalance(spark, Seq(d), k = d.m / 10, miniBatch = 10000,
        partitions = partitions, alpha = 0.2)
    }

    TablePrinter.print(
      "Table 10 (paper Fig. 10): set-intersection checks per partition, M=10000, p=16",
      Seq("dataset", "partition", "checks", "edges"),
      rows.map(r => Seq(r.dataset, r.partition.toString, r.work.toString,
        r.edges.toString)))

    datasets.foreach { d =>
      val mine = rows.filter(_.dataset == d.name)
      assert(mine.size === partitions)
      val works = mine.map(_.work.toDouble)
      val mean = works.sum / works.size
      assert(mean > 0, s"${d.name}: no work recorded")
      // Balanced load: every partition within ±35% of the mean (the paper
      // shows near-equal bars; mini-batch remainders add noise here).
      works.foreach { w =>
        assert(math.abs(w - mean) < mean * 0.35,
          s"${d.name}: imbalanced partition work $w vs mean $mean")
      }
    }

    // Denser graph → more work per partition (paper: 90M vs 12.5M checks).
    val mlMean = rows.filter(_.dataset == "movielens-lite").map(_.work).sum / partitions
    val okMean = rows.filter(_.dataset == "orkut-lite").map(_.work).sum / partitions
    // Normalise by stream length: movielens must do more checks per edge.
    val mlPerEdge = mlMean.toDouble / Datasets.movielensLite.stream(0.2).size
    val okPerEdge = okMean.toDouble / Datasets.orkutLite.stream(0.2).size
    assert(mlPerEdge > okPerEdge,
      s"density-workload correlation broken: ml=$mlPerEdge orkut=$okPerEdge")
  }
}
