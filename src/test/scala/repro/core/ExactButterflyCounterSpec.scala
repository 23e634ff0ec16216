package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.graph.StreamGen

class ExactButterflyCounterSpec extends AnyFunSuite {

  test("empty graph has zero butterflies") {
    assert((new ExactButterflyCounter).count === 0L)
  }

  test("complete bipartite closed forms K_{a,b} = C(a,2)·C(b,2)") {
    for (a <- 2 to 6; b <- 2 to 6) {
      val c = ExactButterflyCounter.countStatic(
        TestGraphs.completeBipartite(a, b).iterator.map { case (l, r) => Edge(l, r) })
      assert(c === TestGraphs.completeBipartiteButterflies(a, b), s"K_$a,$b")
    }
  }

  test("butterfly-free graphs count zero") {
    val c = ExactButterflyCounter.countStatic(
      TestGraphs.butterflyFreeEdges.iterator.map { case (l, r) => Edge(l, r) })
    assert(c === 0L)
  }

  test("count is insertion-order independent") {
    val edges = TestGraphs.randomEdges(10, 10, 40, 3L).map { case (l, r) => Edge(l, r) }
    val a = ExactButterflyCounter.countStatic(edges)
    val b = ExactButterflyCounter.countStatic(edges.reverse)
    val c = ExactButterflyCounter.countStatic(scala.util.Random.shuffle(edges.toList))
    assert(a === b)
    assert(a === c)
  }

  test("insert then delete the same edge restores the count") {
    val counter = new ExactButterflyCounter
    TestGraphs.completeStream(3, 3).foreach(counter.process)
    val full = counter.count
    counter.process(StreamElement.delete(1L, 1L))
    assert(counter.count === full - 4) // (1,1) is in 4 of K_{3,3}'s 9 butterflies
    counter.process(StreamElement.insert(1L, 1L))
    assert(counter.count === full)
  }

  test("deleting every edge returns the count to zero") {
    val counter = new ExactButterflyCounter
    val edges = TestGraphs.completeBipartite(4, 4)
    edges.foreach { case (l, r) => counter.process(StreamElement.insert(l, r)) }
    assert(counter.count === TestGraphs.completeBipartiteButterflies(4, 4))
    edges.foreach { case (l, r) => counter.process(StreamElement.delete(l, r)) }
    assert(counter.count === 0L)
    assert(counter.edgeCount === 0L)
  }

  test("duplicate insertion and missing deletion are rejected") {
    val counter = new ExactButterflyCounter
    counter.process(StreamElement.insert(1L, 1L))
    intercept[IllegalArgumentException](counter.process(StreamElement.insert(1L, 1L)))
    intercept[IllegalArgumentException](counter.process(StreamElement.delete(9L, 9L)))
  }

  test("incremental count over a dynamic stream equals a static recount of the survivors") {
    (1 to 15).foreach { trial =>
      val stream = TestGraphs.randomStream(12, 12, 70, 0.35, trial.toLong)
      val counter = new ExactButterflyCounter
      counter.processAll(stream)
      val survivors = StreamGen.finalEdges(stream)
      assert(counter.count === ExactButterflyCounter.countStatic(survivors),
        s"trial $trial")
      assert(counter.edgeCount === survivors.size.toLong)
    }
  }

  test("mid-stream counts match a from-scratch recount at every prefix") {
    val stream = TestGraphs.randomStream(8, 8, 30, 0.4, 99L)
    val counter = new ExactButterflyCounter
    stream.zipWithIndex.foreach { case (el, i) =>
      counter.process(el)
      val prefixSurvivors = StreamGen.finalEdges(stream.take(i + 1))
      assert(counter.count === ExactButterflyCounter.countStatic(prefixSurvivors),
        s"prefix ${i + 1}")
    }
  }
}
