package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TimingSequenceSpec extends AnyFunSuite {
  import Fixtures.paperQ

  test("paper example: {ε6,ε5,ε4} is a TC-subquery with sequence ε6 ε5 ε4") {
    assert(TimingSequence.timingSequenceOf(paperQ, Set(6, 5, 4)).contains(List(6, 5, 4)))
  }

  test("paper example: {ε3,ε1} is a TC-subquery") {
    assert(TimingSequence.timingSequenceOf(paperQ, Set(3, 1)).contains(List(3, 1)))
  }

  test("singletons are always TC-subqueries") {
    paperQ.edges.map(_.id).foreach { e =>
      assert(TimingSequence.timingSequenceOf(paperQ, Set(e)).contains(List(e)))
    }
  }

  test("{ε6,ε4} is ordered but not prefix-connected ⇒ not TC") {
    assert(paperQ.precedes(6, 4))
    assert(TimingSequence.timingSequenceOf(paperQ, Set(6, 4)).isEmpty)
  }

  test("{ε1,ε2} is ordered but ε1,ε2 not adjacent ⇒ not TC") {
    assert(paperQ.precedes(1, 2))
    assert(TimingSequence.timingSequenceOf(paperQ, Set(1, 2)).isEmpty)
  }

  test("{ε5,ε6} order direction honoured: ascending only") {
    val seq = TimingSequence.timingSequenceOf(paperQ, Set(5, 6))
    assert(seq.contains(List(6, 5)))
  }

  test("unordered adjacent pair is not TC") {
    // ε6 (a→b) and ε2 (d→b) share b but have no timing order
    assert(paperQ.adjacentEdges(6, 2))
    assert(TimingSequence.timingSequenceOf(paperQ, Set(6, 2)).isEmpty)
  }

  test("the paper query itself is not a TC-query") {
    assert(!TimingSequence.isTcQuery(paperQ))
  }

  test("a fully-ordered path query is a TC-query") {
    val q = QueryGraph(
      Seq(QueryVertex(0, "A"), QueryVertex(1, "B"), QueryVertex(2, "C")),
      Seq(QueryEdge(1, 0, 1, "-"), QueryEdge(2, 1, 2, "-")),
      Set((1, 2)),
    )
    assert(TimingSequence.isTcQuery(q))
  }

  test("a fully-ordered but disconnected-prefix query is not TC") {
    // path a→b→c→d with order ε3 ≺ ε1 ≺ ε2: sequence ε3,ε1,ε2 has prefix
    // {ε3} then {ε3, ε1} with ε3=c→d and ε1=a→b: disconnected.
    val q = QueryGraph(
      Seq(QueryVertex(0, "A"), QueryVertex(1, "B"), QueryVertex(2, "C"), QueryVertex(3, "D")),
      Seq(QueryEdge(1, 0, 1, "-"), QueryEdge(2, 1, 2, "-"), QueryEdge(3, 2, 3, "-")),
      Set((3, 1), (1, 2)),
    )
    assert(!TimingSequence.isTcQuery(q))
  }

  test("isPrefixConnected on the paper query") {
    assert(TimingSequence.isPrefixConnected(paperQ, Seq(6, 5, 4)))
    assert(!TimingSequence.isPrefixConnected(paperQ, Seq(6, 4, 5)))
    assert(TimingSequence.isPrefixConnected(paperQ, Seq(3, 1)))
  }

  test("connectivityOrder is a prefix-connected permutation") {
    val ord = TimingSequence.connectivityOrder(paperQ)
    assert(ord.toSet == paperQ.edges.map(_.id).toSet)
    assert(TimingSequence.isPrefixConnected(paperQ, ord))
  }
}
