package repro

import org.scalatest.funsuite.AnyFunSuite

class SynthDataSpec extends AnyFunSuite {

  test("bipartiteEdgesLocal produces exactly m distinct edges") {
    val edges = SynthData.bipartiteEdgesLocal(50, 40, 300, 0.6, 0.6, 1L)
    assert(edges.length === 300)
    assert(edges.toSet.size === 300)
  }

  test("bipartiteEdgesLocal respects the vertex ranges") {
    val edges = SynthData.bipartiteEdgesLocal(30, 20, 200, 0.8, 0.8, 2L)
    edges.foreach { case (l, r) =>
      assert(l >= 1 && l <= 30)
      assert(r >= 1 && r <= 20)
    }
  }

  test("bipartiteEdgesLocal is deterministic in its arguments") {
    val a = SynthData.bipartiteEdgesLocal(30, 20, 200, 0.8, 0.8, 3L)
    val b = SynthData.bipartiteEdgesLocal(30, 20, 200, 0.8, 0.8, 3L)
    val c = SynthData.bipartiteEdgesLocal(30, 20, 200, 0.8, 0.8, 4L)
    assert(a.toSeq === b.toSeq)
    assert(a.toSeq !== c.toSeq)
  }

  test("requesting more edges than the bipartite graph can hold fails") {
    intercept[IllegalArgumentException](
      SynthData.bipartiteEdgesLocal(3, 3, 10, 0.5, 0.5, 1L))
  }

  test("a dense request saturates the complete bipartite graph") {
    val edges = SynthData.bipartiteEdgesLocal(4, 5, 20, 0.5, 0.5, 5L)
    assert(edges.toSet.size === 20)
  }

  test("higher zipf exponent concentrates degree mass on hub vertices") {
    def hubShare(alpha: Double): Double = {
      val edges = SynthData.bipartiteEdgesLocal(1000, 1000, 20000, alpha, 0.0, 6L)
      val byL = edges.groupBy(_._1).view.mapValues(_.length)
      val top = byL.values.toSeq.sorted.reverse.take(10).sum
      top.toDouble / edges.length
    }
    assert(hubShare(1.2) > hubShare(0.3) + 0.05,
      s"skew knob ineffective: ${hubShare(1.2)} vs ${hubShare(0.3)}")
  }

  test("zipf sampler draws the full range and favours low ranks") {
    val z = new SynthData.ZipfSampler(10, 1.0)
    val rng = new java.util.SplittableRandom(7L)
    val counts = new Array[Int](11)
    (1 to 50000).foreach(_ => counts(z.draw(rng)) += 1)
    assert(counts(0) === 0) // ranks start at 1
    assert((1 to 10).forall(counts(_) > 0))
    assert(counts(1) > counts(10), "rank 1 should dominate rank 10")
    // With alpha=1 the expected ratio rank1:rank2 is 2:1.
    assert(math.abs(counts(1).toDouble / counts(2) - 2.0) < 0.25)
  }

  test("zipf sampler with alpha=0 is uniform") {
    val z = new SynthData.ZipfSampler(5, 0.0)
    val rng = new java.util.SplittableRandom(8L)
    val counts = new Array[Int](6)
    (1 to 50000).foreach(_ => counts(z.draw(rng)) += 1)
    (1 to 5).foreach(i => assert(math.abs(counts(i) - 10000) < 600))
  }
}

/** Spark-side wrapper of the bipartite generator. */
class SynthDataSparkSpec extends SparkSpec {
  test("bipartiteEdges DataFrame matches the local generator") {
    val local = SynthData.bipartiteEdgesLocal(30, 20, 150, 0.7, 0.7, 9L)
    val df = SynthData.bipartiteEdges(spark, 30, 20, 150, 0.7, 0.7, 9L)
    assert(df.columns.toSeq === Seq("l", "r"))
    val collected = df.collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(collected.toSet === local.toSet)
    assert(collected.length === 150)
  }
}
