package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class AutomatonSpec extends AnyFunSuite {
  private val a: Byte = 0
  private val b: Byte = 1
  private val c: Byte = 2

  test("Q1 = a*: single self-loop state, accepting start") {
    val m = Automaton.q1(a)
    assert(m.numStates == 1 && m.accepting == Set(0))
    assert(m.next(0, a) == Seq(0))
    assert(m.next(0, b).isEmpty)
    assert(m.prev(0, a) == Seq(0))
  }

  test("Q2 = a . b*: two states") {
    val m = Automaton.q2(a, b)
    assert(m.next(0, a) == Seq(1) && m.next(0, b).isEmpty)
    assert(m.next(1, b) == Seq(1) && m.next(1, a).isEmpty)
    assert(m.accepting == Set(1))
    assert(m.prev(1, a) == Seq(0) && m.prev(1, b) == Seq(1))
  }

  test("Q3 = five-label chain") {
    val m = Automaton.q3(Seq(a, b, c, a, b))
    assert(m.numStates == 6 && m.accepting == Set(5))
    assert(m.next(0, a) == Seq(0 + 1))
    assert(m.next(3, a) == Seq(4))
    assert(m.next(4, b) == Seq(5))
    assert(m.next(5, a).isEmpty)
    intercept[IllegalArgumentException](Automaton.q3(Seq(a, b)))
  }

  test("statesEnteredOn lists destination states per label") {
    val m = Automaton.q2(a, b)
    assert(m.statesEnteredOn(a).toSet == Set(1))
    assert(m.statesEnteredOn(b).toSet == Set(1))
    assert(m.statesEnteredOn(c).isEmpty)
  }

  test("prev is the exact inverse of next") {
    val m = Automaton.q3(Seq(a, b, c, a, b))
    for (q <- 0 until m.numStates; l <- Seq(a, b, c); to <- m.next(q, l))
      assert(m.prev(to, l).contains(q))
  }
}
