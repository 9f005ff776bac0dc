package repro.core.store

import org.scalatest.funsuite.AnyFunSuite

class MsTreeSpec extends AnyFunSuite {

  test("paths share prefixes: one node per distinct prefix") {
    val t  = new MsTree[String](3)
    val s1 = t.add(null, "σ1", 0)
    val s3 = t.add(s1, "σ3", 1)
    val s4 = t.add(s3, "σ4", 2)
    val s9 = t.add(s3, "σ9", 2)
    // Fig 10: matches {σ1}, {σ1σ3}, {σ1σ3σ4}, {σ1σ3σ9} in 4 nodes
    assert(t.liveCount == 4)
    assert(t.pathPayloads(s4) == IndexedSeq("σ1", "σ3", "σ4"))
    assert(t.pathPayloads(s9) == IndexedSeq("σ1", "σ3", "σ9"))
    assert(t.levelNodes(2).map(_.payload) == Vector("σ4", "σ9"))
  }

  test("level lists enumerate nodes in insertion order") {
    val t = new MsTree[Int](2)
    val roots = (1 to 5).map(i => t.add(null, i, 0))
    roots.foreach(r => t.add(r, r.payload * 10, 1))
    assert(t.levelNodes(0).map(_.payload) == Vector(1, 2, 3, 4, 5))
    assert(t.levelNodes(1).map(_.payload) == Vector(10, 20, 30, 40, 50))
    assert(t.levelSize(0) == 5 && t.levelSize(1) == 5)
  }

  test("partialRemove unlinks level list and parent's children but keeps upward path") {
    val t  = new MsTree[String](2)
    val p  = t.add(null, "p", 0)
    val c1 = t.add(p, "c1", 1)
    val c2 = t.add(p, "c2", 1)
    t.partialRemove(c1)
    assert(!c1.alive)
    assert(t.levelNodes(1).map(_.payload) == Vector("c2"))
    assert(p.children.toSet == Set(c2))
    // upward pointer survives (Theorem 6's requirement)
    assert(c1.parent eq p)
    assert(t.pathPayloads(c1) == IndexedSeq("p", "c1"))
    assert(t.liveCount == 2)
  }

  test("removing a parent keeps its child set for descendant discovery") {
    val t = new MsTree[String](3)
    val a = t.add(null, "a", 0)
    val b = t.add(a, "b", 1)
    val c = t.add(b, "c", 2)
    t.partialRemove(a)
    // Fig 14: children remain discoverable from the removed node
    assert(a.children.toSet == Set(b))
    t.partialRemove(b)
    assert(b.children.toSet == Set(c))
    t.partialRemove(c)
    assert(t.liveCount == 0)
    (0 until 3).foreach(l => assert(t.levelNodes(l).isEmpty))
  }

  test("partialRemove is idempotent") {
    val t = new MsTree[String](1)
    val a = t.add(null, "a", 0)
    t.partialRemove(a)
    t.partialRemove(a)
    assert(t.liveCount == 0)
  }

  test("interleaved inserts and removals keep list integrity") {
    val t     = new MsTree[Int](1)
    val nodes = (1 to 100).map(i => t.add(null, i, 0))
    nodes.filter(_.payload % 2 == 0).foreach(t.partialRemove)
    assert(t.levelNodes(0).map(_.payload) == (1 to 100 by 2).toVector)
    val more = (101 to 110).map(i => t.add(null, i, 0))
    assert(t.levelNodes(0).map(_.payload).takeRight(10) == (101 to 110).toVector)
    assert(t.liveCount == 60)
    more.foreach(t.partialRemove)
    assert(t.liveCount == 50)
  }

  test("level/parent mismatch rejected") {
    val t = new MsTree[String](2)
    val a = t.add(null, "a", 0)
    intercept[IllegalArgumentException](t.add(a, "b", 0))
    intercept[IllegalArgumentException](t.add(null, "b", 1))
  }
}
