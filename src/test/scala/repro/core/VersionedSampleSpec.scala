package repro.core

import org.scalatest.funsuite.AnyFunSuite

class VersionedSampleSpec extends AnyFunSuite {

  private def snapOf(base: Seq[Edge], deltas: Seq[(Int, Boolean, Edge)],
                     m: Int): VersionedSampleSnapshot =
    VersionedSampleSnapshot(
      base.map(_.left).toArray, base.map(_.right).toArray,
      deltas.map(_._1).toArray, deltas.map(_._2).toArray,
      deltas.map(_._3.left).toArray, deltas.map(_._3.right).toArray,
      new Array[Long](m), new Array[Long](m), new Array[Boolean](m),
      new Array[Long](m), new Array[Long](m), new Array[Long](m), k = 100)

  test("replayer at version 0 exposes exactly the base sample") {
    val snap = snapOf(Seq(Edge(1L, 1L), Edge(2L, 2L)),
      Seq((1, true, Edge(3L, 3L))), m = 2)
    val r = new SampleReplayer(snap)
    r.advanceTo(0)
    assert(r.view.leftNeighbors(1L) === Set(1L))
    assert(r.view.leftNeighbors(3L).isEmpty)
  }

  test("deltas become visible exactly at their version") {
    val snap = snapOf(Seq(Edge(1L, 1L)),
      Seq((1, true, Edge(2L, 2L)), (3, false, Edge(1L, 1L))), m = 3)
    val r = new SampleReplayer(snap)
    r.advanceTo(0)
    assert(r.view.leftNeighbors(2L).isEmpty)
    r.advanceTo(1)
    assert(r.view.leftNeighbors(2L) === Set(2L))
    assert(r.view.leftNeighbors(1L) === Set(1L))
    r.advanceTo(2)
    assert(r.view.leftNeighbors(1L) === Set(1L)) // removal not yet visible
    r.advanceTo(3)
    assert(r.view.leftNeighbors(1L).isEmpty)
  }

  test("advancing multiple versions at once applies all pending deltas") {
    val snap = snapOf(Nil,
      Seq((1, true, Edge(1L, 1L)), (2, true, Edge(2L, 2L)), (3, true, Edge(3L, 3L))),
      m = 3)
    val r = new SampleReplayer(snap)
    r.advanceTo(3)
    assert(Seq(1L, 2L, 3L).forall(i => r.view.leftNeighbors(i) === Set(i)))
  }

  test("replayed versions equal sequentially materialised samples on random streams") {
    (1 to 10).foreach { trial =>
      val rng = new java.util.SplittableRandom(trial.toLong)
      val stream = repro.TestGraphs.randomStream(12, 12, 80, 0.3, trial.toLong + 50)
      // Drive RP, recording per-version expected sampled-edge sets.
      val sample = new AdjacencySample
      val rp = new RandomPairing(10, sample, rng)
      val expected = scala.collection.mutable.ArrayBuffer[Set[Edge]](Set.empty)
      val deltas = scala.collection.mutable.ArrayBuffer.empty[(Int, Boolean, Edge)]
      expected(0) = sample.snapshotEdges().toSet
      stream.zipWithIndex.foreach { case (el, i) =>
        rp.apply(el).foreach {
          case AddToSample(e)      => deltas += ((i + 1, true, e))
          case RemoveFromSample(e) => deltas += ((i + 1, false, e))
        }
        expected += sample.snapshotEdges().toSet
      }
      // Rebuild every version (here the base is the empty pre-stream state).
      val snap = snapOf(Nil, deltas.toSeq, stream.size)
      val replayer = new SampleReplayer(snap)
      expected.zipWithIndex.foreach { case (want, v) =>
        replayer.advanceTo(v)
        val got = (want ++ Set.empty).map(identity) // force Set
        val lefts = want.map(_.left)
        lefts.foreach { l =>
          assert(replayer.view.leftNeighbors(l) ===
            want.filter(_.left == l).map(_.right), s"trial $trial version $v vertex $l")
        }
        assert(got.forall(e => replayer.view.leftNeighbors(e.left).contains(e.right)))
      }
    }
  }

  test("triplet accessor round-trips the parallel arrays") {
    val snap = VersionedSampleSnapshot(
      Array.empty, Array.empty,
      Array.empty, Array.empty, Array.empty, Array.empty,
      Array(1L), Array(2L), Array(true),
      Array(10L), Array(1L), Array(2L), k = 5)
    assert(snap.triplet(0) === VersionTriplet(10L, 1L, 2L))
    assert(snap.batchSize === 1)
  }
}
