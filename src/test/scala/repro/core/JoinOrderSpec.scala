package repro.core

import org.scalatest.funsuite.AnyFunSuite

class JoinOrderSpec extends AnyFunSuite {
  import Fixtures.paperQ

  test("joint number: shared vertices + cross timing pairs (Definition 12)") {
    // {ε6,ε5,ε4} vs {ε2}: share vertices b,d; no cross order pairs ⇒ 2
    assert(JoinOrder.jointNumber(paperQ, Set(6, 5, 4), Set(2)) == 2)
    // {ε6,ε5,ε4} vs {ε3,ε1}: share vertex a; no cross order pairs ⇒ 1
    assert(JoinOrder.jointNumber(paperQ, Set(6, 5, 4), Set(3, 1)) == 1)
    // {ε3,ε1} vs {ε2}: no shared vertices; ε1≺ε2 and ε3≺ε2 ⇒ 2
    assert(JoinOrder.jointNumber(paperQ, Set(3, 1), Set(2)) == 2)
  }

  test("order yields a prefix-connected permutation covering all subqueries") {
    val subs = Decomposer.greedyCover(paperQ, Decomposer.tcSub(paperQ))
    val ord  = JoinOrder.order(paperQ, subs)
    assert(ord.toSet == subs.toSet)
    ord.indices.foreach { i =>
      val prefix = ord.take(i + 1).flatMap(_.edgeSet).toSet
      assert(paperQ.isWeaklyConnected(prefix), s"prefix $i")
    }
  }

  test("order starts with the max-joint-number connected pair") {
    val subs = Decomposer.greedyCover(paperQ, Decomposer.tcSub(paperQ))
    val ord  = JoinOrder.order(paperQ, subs)
    // the only connected pairs are ({654},{31}) JN=1 and ({654},{2}) JN=2
    assert(ord.take(2).map(_.edgeSet).toSet == Set(Set(6, 5, 4), Set(2)))
    assert(ord(2).edgeSet == Set(3, 1))
  }

  test("randomOrder is prefix-connected for many seeds") {
    val subs = Decomposer.greedyCover(paperQ, Decomposer.tcSub(paperQ))
    (1 to 25).foreach { s =>
      val ord = JoinOrder.randomOrder(paperQ, subs, s)
      assert(ord.toSet == subs.toSet)
      ord.indices.foreach { i =>
        assert(paperQ.isWeaklyConnected(ord.take(i + 1).flatMap(_.edgeSet).toSet))
      }
    }
  }

  test("single-subquery order is trivial") {
    val one = Vector(TcSubquery(IndexedSeq(6)))
    assert(JoinOrder.order(paperQ, one) == one)
    assert(JoinOrder.randomOrder(paperQ, one, 3) == one)
  }
}
