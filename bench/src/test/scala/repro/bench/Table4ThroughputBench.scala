package repro.bench

import repro.SparkSpec
import repro.experiments.{Experiments, TablePrinter}
import repro.graph.Datasets

/** Table 4 — throughput with 20% deletions while varying the sample size
  * (paper Fig. 4). Expected shapes: ABACUS ≈ FLEET ≈ CAS, throughput drops
  * as k grows. PARABACUS runs with mini-batches of 10K edges (paper: 500 —
  * Spark task scheduling costs ~ms where the paper's Java threads cost ~µs,
  * so the break-even mini-batch is larger here; see EXPERIMENTS.md).
  */
class Table4ThroughputBench extends SparkSpec {

  test("Table 4: throughput with alpha=20% (paper Fig. 4)") {
    val rows = Datasets.all.flatMap { d =>
      Experiments.throughputAll(spark, Seq(d), d.sampleSizes, alpha = 0.2,
        miniBatch = 10000, partitions = 16)
    }

    val algOrder = Seq("abacus", "abacus-ins-only", "fleet", "cas")
    TablePrinter.print(
      "Table 4 (paper Fig. 4): throughput [edges/s], alpha=20%",
      Seq("dataset", "k", "abacus(ins+del)", "abacus(ins-only)", "fleet", "cas",
          "parabacus"),
      rows.groupBy(r => (r.dataset, r.k)).toSeq
        .sortBy { case ((d, k), _) => (Datasets.all.indexWhere(_.name == d), k) }
        .map { case ((d, k), rs) =>
          def of(alg: String) = rs.find(_.algorithm == alg).map(_.edgesPerSec).getOrElse(0.0)
          val pa = rs.find(_.algorithm.startsWith("parabacus")).map(_.edgesPerSec).getOrElse(0.0)
          Seq(d, k.toString) ++ algOrder.map(a => TablePrinter.sci(of(a))) :+
            TablePrinter.sci(pa)
        })

    rows.foreach(r => assert(r.edgesPerSec > 0, r.toString))

    Datasets.all.foreach { d =>
      // ABACUS throughput is in the same ballpark as the insert-only
      // baselines (within 8x either way — the paper reports "close").
      d.sampleSizes.foreach { k =>
        val here = rows.filter(r => r.dataset == d.name && r.k == k)
        val ab = here.find(_.algorithm == "abacus").get.edgesPerSec
        val fl = here.find(_.algorithm == "fleet").get.edgesPerSec
        assert(ab > fl / 8 && ab < fl * 8, s"${d.name} k=$k: abacus=$ab fleet=$fl")
      }
      // More sample means more per-edge work: throughput shrinks with k.
      val ab = rows.filter(r => r.dataset == d.name && r.algorithm == "abacus")
      val small = ab.find(_.k == d.sampleSizes.head).get.edgesPerSec
      val large = ab.find(_.k == d.sampleSizes.last).get.edgesPerSec
      assert(large < small, s"${d.name}: throughput did not drop with k")
    }
  }
}
