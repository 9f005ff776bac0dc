package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DecomposerSpec extends AnyFunSuite {
  import Fixtures.paperQ

  test("TCsub(Q) of the paper query is exactly the 10 subqueries of §VI-B") {
    val got = Decomposer.tcSub(paperQ).map(_.edgeSet).toSet
    val expected = Set(
      Set(6, 5, 4), Set(3, 1), Set(5, 4), Set(6, 5),
      Set(1), Set(2), Set(3), Set(4), Set(5), Set(6),
    )
    assert(got == expected)
    assert(got.size == 10)
  }

  test("TCsub sequences are valid timing sequences") {
    Decomposer.tcSub(paperQ).foreach { sq =>
      assert(TimingSequence.timingSequenceOf(paperQ, sq.edgeSet).contains(sq.seq.toList))
    }
  }

  test("greedy decomposition of the paper query is {ε6ε5ε4},{ε3ε1},{ε2} (Fig 9)") {
    val d = Decomposer.decompose(paperQ)
    assert(d.k == 3)
    assert(d.subqueries.map(_.edgeSet).toSet == Set(Set(6, 5, 4), Set(3, 1), Set(2)))
    Decomposer.validate(paperQ, d)
  }

  test("decomposition join order is prefix-connected") {
    val d = Decomposer.decompose(paperQ)
    d.subqueries.indices.foreach { i =>
      assert(paperQ.isWeaklyConnected(d.prefixEdges(i).toSet), s"prefix $i")
    }
  }

  test("positionOf maps every query edge to its chain slot") {
    val d = Decomposer.decompose(paperQ)
    paperQ.edges.map(_.id).foreach { e =>
      val (i, j) = d.positionOf(e)
      assert(d.subqueries(i).seq(j) == e)
    }
  }

  test("a TC-query decomposes into a single subquery") {
    val q = QueryGraph(
      Seq(QueryVertex(0, "A"), QueryVertex(1, "B"), QueryVertex(2, "C")),
      Seq(QueryEdge(1, 0, 1, "-"), QueryEdge(2, 1, 2, "-")),
      Set((1, 2)),
    )
    val d = Decomposer.decompose(q)
    assert(d.k == 1)
    assert(d.subqueries.head.seq == IndexedSeq(1, 2))
  }

  test("an order-free query decomposes into singletons") {
    val q = QueryGraph(
      Seq(QueryVertex(0, "A"), QueryVertex(1, "B"), QueryVertex(2, "C")),
      Seq(QueryEdge(1, 0, 1, "-"), QueryEdge(2, 1, 2, "-")),
      Set.empty,
    )
    val d = Decomposer.decompose(q)
    assert(d.k == 2)
    assert(d.subqueries.forall(_.size == 1))
  }

  test("random decompositions are always valid (30 seeds)") {
    (1 to 30).foreach { s =>
      Decomposer.validate(paperQ, Decomposer.randomDecompose(paperQ, s))
      Decomposer.validate(paperQ, Decomposer.randomJoinOrder(paperQ, s))
      Decomposer.validate(paperQ, Decomposer.randomBoth(paperQ, s))
    }
  }

  test("cost model (Theorem 7): N = (|E|-1 + k(k-1)/2)/d") {
    // paperQ: |E|=6, d=6, k=3 ⇒ N = (5 + 3)/6
    assert(math.abs(Decomposer.expectedJoinOps(paperQ, 3) - 8.0 / 6.0) < 1e-9)
    // cost increases with k (the paper's argument for minimising k)
    val costs = (1 to 6).map(Decomposer.expectedJoinOps(paperQ, _))
    assert(costs == costs.sorted)
  }

  test("greedy never uses more subqueries than the singleton cover") {
    val d = Decomposer.decompose(paperQ)
    assert(d.k <= paperQ.edges.size)
  }

  test("tcSub respects the maxStates cap") {
    val capped = Decomposer.tcSub(paperQ, maxStates = 6)
    // singles always enumerated; extension capped
    assert(capped.size >= 6)
    assert(capped.size <= 10)
  }
}
