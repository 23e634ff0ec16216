package repro.core

import repro.{SparkSpec, TestGraphs}

class ParAbacusSpec extends SparkSpec {

  private def assertSameEstimate(a: Double, b: Double, clue: String): Unit = {
    val tol = 1e-9 * math.max(1.0, math.max(math.abs(a), math.abs(b)))
    assert(math.abs(a - b) <= tol, s"$clue: abacus=$a parabacus=$b")
  }

  test("partition ranges are contiguous, equal-sized and cover the batch") {
    for (m <- Seq(1, 7, 16, 100); p <- Seq(1, 3, 8, 16)) {
      val ranges = (0 until p).map(ParAbacus.range(_, p, m))
      assert(ranges.head._1 === 0)
      assert(ranges.last._2 === m)
      ranges.sliding(2).foreach {
        case Seq((_, hi), (lo2, _)) => assert(hi === lo2)
        case _                      =>
      }
      val sizes = ranges.map { case (lo, hi) => hi - lo }
      assert(sizes.max - sizes.min <= 1, s"m=$m p=$p sizes=$sizes")
    }
  }

  test("Theorem 5: ParAbacus equals Abacus on insert-only streams") {
    val stream = TestGraphs.completeStream(8, 8)
    for (batch <- Seq(1, 7, 64); p <- Seq(1, 4)) {
      val seq = new Abacus(k = 20, seed = 5L)
      seq.processAll(stream)
      val par = new ParAbacus(k = 20, seed = 5L, spark, p)
      par.processAll(stream, batch)
      assertSameEstimate(seq.estimate, par.estimate, s"batch=$batch p=$p")
    }
  }

  test("Theorem 5: ParAbacus equals Abacus on fully dynamic streams") {
    for (trial <- 1 to 5; batch <- Seq(13, 50); p <- Seq(2, 4)) {
      val stream = TestGraphs.randomStream(15, 15, 200, 0.3, trial.toLong)
      val seq = new Abacus(k = 25, seed = trial.toLong)
      seq.processAll(stream)
      val par = new ParAbacus(k = 25, seed = trial.toLong, spark, p)
      par.processAll(stream, batch)
      assertSameEstimate(seq.estimate, par.estimate, s"trial=$trial batch=$batch p=$p")
    }
  }

  test("ParAbacus is exact with a big budget like Abacus") {
    val stream = TestGraphs.randomStream(10, 10, 80, 0.25, 3L)
    val exact = new ExactButterflyCounter
    exact.processAll(stream)
    val par = new ParAbacus(k = 10000, seed = 1L, spark, numPartitions = 4)
    par.processAll(stream, 17)
    assert(math.abs(par.estimate - exact.count) < 1e-6)
  }

  test("batch boundaries do not change the estimate") {
    val stream = TestGraphs.randomStream(15, 15, 150, 0.2, 8L)
    val ests = Seq(10, 37, 150, 500).map { batch =>
      val par = new ParAbacus(k = 15, seed = 9L, spark, numPartitions = 3)
      par.processAll(stream, batch)
      par.estimate
    }
    ests.sliding(2).foreach { case Seq(a, b) => assertSameEstimate(a, b, "batch split") }
  }

  test("empty batch is a no-op") {
    val par = new ParAbacus(k = 10, seed = 1L, spark, numPartitions = 2)
    assert(par.processBatch(IndexedSeq.empty) === Nil)
    assert(par.estimate === 0.0)
    assert(par.processed === 0L)
  }

  test("batches smaller than the partition count still work") {
    val par = new ParAbacus(k = 10, seed = 1L, spark, numPartitions = 8)
    val res = par.processBatch(IndexedSeq(StreamElement.insert(1L, 1L),
      StreamElement.insert(2L, 2L)))
    assert(res.size === 8)
    assert(res.map(_.edges).sum === 2)
  }

  test("per-partition bookkeeping sums to the whole stream") {
    val stream = TestGraphs.randomStream(15, 15, 150, 0.2, 11L)
    val par = new ParAbacus(k = 30, seed = 2L, spark, numPartitions = 4)
    par.processAll(stream, 25)
    assert(par.processed === stream.size.toLong)
    assert(par.edgesPerPartition.sum === stream.size.toLong)
    // Work must match what Abacus spends on the same configuration.
    val seq = new Abacus(k = 30, seed = 2L)
    seq.processAll(stream)
    assert(par.workPerPartition.sum === seq.totalWork)
  }

  test("sample state after a batch matches Abacus's (consolidation)") {
    val stream = TestGraphs.randomStream(15, 15, 150, 0.25, 21L)
    val seq = new Abacus(k = 12, seed = 7L)
    seq.processAll(stream)
    val par = new ParAbacus(k = 12, seed = 7L, spark, numPartitions = 2)
    par.processAll(stream, 40)
    assert(par.sampleSize === seq.sampleSize)
  }
}
