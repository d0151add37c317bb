package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** The §3.1.1 tree structure and its two APIs in isolation. */
class PrefixTreeSpec extends AnyFunSuite {

  test("a fresh tree has only the root (index 0)") {
    val t = new PrefixTree
    assert(t.size == 1)
    assert(t.parent(0) == -1)
    assert(t.key(0) == null)
    assert(t.sequence(0) == Nil)
  }

  test("AddNode assigns sequential indexes starting from 1") {
    val t = new PrefixTree
    assert(t.addNode(0, ColValue(1, 1.0)) == 1)
    assert(t.addNode(0, ColValue(2, 2.0)) == 2)
    assert(t.addNode(1, ColValue(2, 2.0)) == 3)
    assert(t.size == 4)
  }

  test("GetIndex finds children by key; -1 when absent") {
    val t = new PrefixTree
    val a = t.addNode(0, ColValue(1, 1.0))
    val b = t.addNode(a, ColValue(2, 2.0))
    assert(t.getIndex(0, ColValue(1, 1.0)) == a)
    assert(t.getIndex(a, ColValue(2, 2.0)) == b)
    assert(t.getIndex(0, ColValue(2, 2.0)) == -1)
    assert(t.getIndex(b, ColValue(1, 1.0)) == -1)
  }

  test("keys are compared structurally (same col+value = same key)") {
    val t = new PrefixTree
    val a = t.addNode(0, ColValue(3, 0.5))
    assert(t.getIndex(0, ColValue(3, 0.5)) == a)
    assert(t.getIndex(0, ColValue(3, 0.25)) == -1)
    assert(t.getIndex(0, ColValue(2, 0.5)) == -1)
  }

  test("sequence concatenates keys from root to node") {
    val t = new PrefixTree
    val a = t.addNode(0, ColValue(1, 1.0))
    val b = t.addNode(a, ColValue(2, 2.0))
    val c = t.addNode(b, ColValue(3, 3.0))
    assert(t.sequence(c) == List(ColValue(1, 1.0), ColValue(2, 2.0), ColValue(3, 3.0)))
  }
}
