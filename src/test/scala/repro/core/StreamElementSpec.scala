package repro.core

import org.scalatest.funsuite.AnyFunSuite

class StreamElementSpec extends AnyFunSuite {

  test("insert helper builds a positive element") {
    val el = StreamElement.insert(3L, 7L)
    assert(el.edge === Edge(3L, 7L))
    assert(el.isInsert)
    assert(el.sign === 1)
  }

  test("delete helper builds a negative element") {
    val el = StreamElement.delete(3L, 7L)
    assert(el.edge === Edge(3L, 7L))
    assert(!el.isInsert)
    assert(el.sign === -1)
  }

  test("edges are value-compared") {
    assert(Edge(1L, 2L) === Edge(1L, 2L))
    assert(Edge(1L, 2L) !== Edge(2L, 1L))
  }

  test("insert and delete of the same edge differ only in sign") {
    val i = StreamElement.insert(5L, 6L)
    val d = StreamElement.delete(5L, 6L)
    assert(i.edge === d.edge)
    assert(i.sign === -d.sign)
  }

  test("elements usable as map keys (case-class semantics)") {
    val m = Map(StreamElement.insert(1L, 1L) -> "a")
    assert(m(StreamElement.insert(1L, 1L)) === "a")
  }
}
