package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.LockMode.{S, X}

/** The pre-computed lock plans (§V-A's worst-case access lists) must match
  * the engine's actual access sequence — the concurrency layer enqueues
  * exactly these requests before launching a transaction.
  */
class EnginePlanSpec extends AnyFunSuite {
  import Fixtures._

  private def engine = new TimingEngine(paperQ, Decomposer.decompose(paperQ), StoreMode.MsTree)

  /** A guard that records the key/mode sequence and verifies it against a
    * plan prefix (skips = cancelled suffix steps).
    */
  private final class RecordingGuard(plan: Vector[(ItemKey, LockMode)]) extends Guard {
    var cursor            = 0
    var skipped           = 0
    override def exec[A](key: ItemKey, mode: LockMode)(f: => A): A = {
      assert(cursor < plan.length, "executed past the plan")
      assert(plan(cursor) == (key, mode), s"step $cursor: planned ${plan(cursor)}, executed ($key,$mode)")
      cursor += 1
      f
    }
    override def skip(n: Int): Unit = { cursor += n; skipped += n }
  }

  test("σ matching nothing has an empty insert/delete plan (Alg 3 CONTINUE)") {
    val eng   = engine
    val alien = StreamEdge(1, 900, "Z", 901, "Z", "zzz", 1)
    assert(eng.insertPlan(alien).isEmpty)
    assert(eng.deletePlan(alien).isEmpty)
  }

  test("first-chain-edge insert plans a single X") {
    val eng = engine
    val s6  = e(va, vb, 1) // matches ε6 only: first edge of the {6,5,4} chain
    val plan = eng.insertPlan(s6)
    assert(plan.length == 1)
    assert(plan.head._2 == X)
  }

  test("mid-chain insert plans S on the predecessor then X on the item") {
    val eng = engine
    val s5  = e(vb, vc, 1) // matches ε5: second edge of the chain
    val plan = eng.insertPlan(s5)
    assert(plan.map(_._2) == Vector(S, X))
    assert(plan(0)._1.level == 0 && plan(1)._1.level == 1)
    assert(plan(0)._1.list == plan(1)._1.list && plan(0)._1.list > 0)
  }

  test("chain-completing insert plans the L0 cascade (§V-A's Ins(σ14) example)") {
    val eng = engine
    val s4  = e(vc, vd, 1) // matches ε4: last edge of the 3-chain
    val plan = eng.insertPlan(s4)
    // S(chain,1) X(chain,2) then L0 cascade to level k-1: for the subquery
    // at join position i: [S(L0,i-1)] X(L0,i), then (S(chain), X(L0)) pairs
    assert(plan.take(2).map(_._2) == Vector(S, X))
    val l0Writes = plan.filter(p => p._1.list == 0 && p._2 == X)
    assert(l0Writes.map(_._1.level).sorted.last == eng.decomposition.k - 1)
  }

  test("delete plans X on every chain level then every L0 level from the subquery on") {
    val eng = engine
    val s6  = e(va, vb, 1)
    val plan = eng.deletePlan(s6)
    assert(plan.nonEmpty && plan.forall(_._2 == X))
    val (i, _) = eng.decomposition.positionOf(6)
    val chainKeys = plan.filter(_._1.list == i + 1).map(_._1.level)
    assert(chainKeys == (0 until 3).toVector, "all chain levels in order")
    val l0Keys = plan.filter(_._1.list == 0).map(_._1.level)
    assert(l0Keys == (i until eng.decomposition.k).toVector)
  }

  test("execution consumes exactly the planned steps (insert, full embedding)") {
    val eng = engine
    paperEmbedding().foreach { ed =>
      val plan  = eng.insertPlan(ed)
      val guard = new RecordingGuard(plan)
      eng.insert(ed, guard)
      assert(guard.cursor == plan.length, s"plan fully consumed for $ed")
    }
    assert(eng.results.size == 1)
  }

  test("execution consumes exactly the planned steps (delete)") {
    val eng = engine
    val emb = paperEmbedding()
    emb.foreach(eng.insert)
    emb.foreach { ed =>
      val plan  = eng.deletePlan(ed)
      val guard = new RecordingGuard(plan)
      eng.delete(ed, guard)
      assert(guard.cursor == plan.length)
    }
    assert(eng.results.isEmpty)
  }

  test("aborted groups skip the remainder of their planned steps") {
    val eng = engine
    val s5  = e(vb, vc, 1) // ε5 with empty predecessor: discardable
    val plan  = eng.insertPlan(s5)
    val guard = new RecordingGuard(plan)
    eng.insert(s5, guard)
    assert(guard.cursor == plan.length)
    assert(guard.skipped == 1, "the X step after the empty join is skipped")
  }

  test("multi-position edges concatenate their group plans") {
    // an edge matching two query edges (wiki-style repeated label pairs)
    val q = QueryGraph(
      Seq(QueryVertex(0, "A"), QueryVertex(1, "B"), QueryVertex(2, "A"), QueryVertex(3, "B")),
      Seq(QueryEdge(1, 0, 1, "-"), QueryEdge(2, 1, 2, "x"), QueryEdge(3, 2, 3, "-")),
      Set((1, 2), (2, 3)),
    )
    val eng = new TimingEngine(q, Decomposer.decompose(q), StoreMode.MsTree)
    val ab  = StreamEdge(7, 50, "A", 51, "B", "-", 1) // matches ε1 and ε3
    val plan = eng.insertPlan(ab)
    // two groups: ε1 (first edge → 1 step) and ε3 (third edge → ≥2 steps)
    assert(plan.length >= 3)
    val guard = new RecordingGuard(plan)
    eng.insert(ab, guard)
    assert(guard.cursor == plan.length)
  }
}
