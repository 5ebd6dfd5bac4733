package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ExpansionStateSpec extends AnyFunSuite {

  test("insert/pop returns the minimum D_rest first") {
    val e = new ExpansionState(0)
    e.insert(10L, 5); e.insert(11L, 2); e.insert(12L, 9)
    val popped = e.popKMin(lambda = 1.0, budget = Long.MaxValue)
    assert(popped.map(_._1).toSeq == Seq(11L, 10L, 12L))
  }

  test("ties in D_rest break by vertex id (deterministic pops)") {
    val e = new ExpansionState(0)
    e.insert(7L, 3); e.insert(4L, 3); e.insert(9L, 3)
    val popped = e.popKMin(1.0, Long.MaxValue)
    assert(popped.map(_._1).toSeq == Seq(4L, 7L, 9L))
  }

  test("duplicate inserts are ignored") {
    val e = new ExpansionState(0)
    e.insert(5L, 2)
    e.insert(5L, 1) // stale refresh ignored, as in Alg. 1
    assert(e.boundarySize == 1)
    assert(e.popKMin(1.0, Long.MaxValue).toSeq == Seq((5L, 2)))
  }

  test("a popped vertex never re-enters the boundary") {
    val e = new ExpansionState(0)
    e.insert(5L, 2)
    e.popKMin(1.0, Long.MaxValue)
    e.insert(5L, 4)
    assert(e.boundarySize == 0)
  }

  test("markExpanded blocks later inserts (random-restart vertices)") {
    val e = new ExpansionState(1)
    e.markExpanded(3L)
    e.insert(3L, 7)
    assert(e.boundarySize == 0)
  }

  test("popKMin pops ceil(lambda * |B|) vertices") {
    val e = new ExpansionState(0)
    (1 to 100).foreach(i => e.insert(i.toLong, i))
    val popped = e.popKMin(lambda = 0.1, budget = Long.MaxValue)
    assert(popped.length == 10)
    assert(e.boundarySize == 90)
  }

  test("popKMin pops at least one vertex even for tiny lambda") {
    val e = new ExpansionState(0)
    e.insert(1L, 5)
    assert(e.popKMin(0.0001, Long.MaxValue).length == 1)
  }

  test("budget throttle stops popping once D_rest sum reaches the budget") {
    val e = new ExpansionState(0)
    (1 to 100).foreach(i => e.insert(i.toLong, 10))
    val popped = e.popKMin(lambda = 1.0, budget = 35)
    // pops of 10 each: 10,20,30 < 35 → pops a 4th, then stops
    assert(popped.length == 4)
  }

  test("empty boundary pops nothing") {
    val e = new ExpansionState(0)
    assert(e.popKMin(1.0, 100).isEmpty)
  }

  test("size and done are driver-maintained plain state") {
    val e = new ExpansionState(2)
    e.size += 7
    assert(e.size == 7 && !e.done)
    e.done = true
    assert(e.done)
  }
}
