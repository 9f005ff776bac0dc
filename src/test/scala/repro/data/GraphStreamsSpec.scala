package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Matching

class GraphStreamsSpec extends AnyFunSuite {

  test("timestamps are 1..n, strictly increasing, ids unique (Definition 1)") {
    for (s <- Seq(GraphStreams.traffic(500, 20), GraphStreams.wikiTalk(500, 20), GraphStreams.lsbench(500, 20))) {
      assert(s.map(_.ts) == (1 to 500).map(_.toLong))
      assert(s.map(_.id).distinct.size == 500)
    }
  }

  test("generators are deterministic in (n, seed)") {
    assert(GraphStreams.traffic(200, 10, seed = 3) == GraphStreams.traffic(200, 10, seed = 3))
    assert(GraphStreams.wikiTalk(200, 10, seed = 3) == GraphStreams.wikiTalk(200, 10, seed = 3))
    assert(GraphStreams.lsbench(200, 10, seed = 3) == GraphStreams.lsbench(200, 10, seed = 3))
    assert(GraphStreams.traffic(200, 10, seed = 3) != GraphStreams.traffic(200, 10, seed = 4))
  }

  test("traffic: all vertices labelled IP, ports Zipf-skewed (top ports >50%)") {
    val s = GraphStreams.traffic(5000, 50)
    assert(s.forall(e => e.srcLabel == "IP" && e.dstLabel == "IP"))
    val byLabel = s.groupBy(_.label).view.mapValues(_.size).toMap
    val top6    = byLabel.values.toSeq.sorted.reverse.take(6).sum
    assert(top6 > s.size / 2, s"top-6 edge labels cover ${top6}/${s.size}")
  }

  test("traffic: no self-loops") {
    assert(GraphStreams.traffic(2000, 15).forall(e => e.src != e.dst))
  }

  test("wikiTalk: vertex labels are single letters, consistent per vertex") {
    val s = GraphStreams.wikiTalk(2000, 40)
    assert(s.forall(e => e.srcLabel.length == 1 && e.dstLabel.length == 1))
    val byVertex = (s.map(e => e.src -> e.srcLabel) ++ s.map(e => e.dst -> e.dstLabel)).groupBy(_._1)
    byVertex.foreach { case (v, ls) => assert(ls.map(_._2).distinct.size == 1, s"vertex $v") }
  }

  test("lsbench: typed schema respected") {
    val s = GraphStreams.lsbench(3000, 30)
    val validTriples = Set(
      ("user", "follows", "user"), ("user", "likes", "post"), ("user", "posts", "post"),
      ("post", "tags", "tag"), ("user", "at", "gps"), ("user", "uploads", "photo"),
    )
    assert(s.forall(e => validTriples((e.srcLabel, e.label, e.dstLabel))))
    // vertex namespaces: a vertex id always carries one label
    val byVertex = (s.map(e => e.src -> e.srcLabel) ++ s.map(e => e.dst -> e.dstLabel)).groupBy(_._1)
    byVertex.foreach { case (v, ls) => assert(ls.map(_._2).distinct.size == 1, s"vertex $v") }
  }

  test("trafficWithAttack plants exactly one Fig-1 pattern, detectable") {
    val s = GraphStreams.trafficWithAttack(2000, 25, plantAt = 900)
    val q = GraphStreams.attackQuery
    val windowEdges = s.filter(e => e.ts > 870 && e.ts <= 930)
    val found = repro.core.Fixtures.bruteForce(q, windowEdges)
    assert(found.size == 1, s"expected the planted attack, found ${found.size}")
    // the attack query itself is a valid 5-edge TC pattern
    assert(q.edges.size == 5)
    assert(repro.core.TimingSequence.isTcQuery(q))
  }

  test("zipf sampler skews toward rank 1") {
    val rnd = new scala.util.Random(1)
    val z   = new GraphStreams.Zipf(100, 1.2, rnd)
    val xs  = Vector.fill(20000)(z.sample())
    assert(xs.forall(x => x >= 1 && x <= 100))
    val c1 = xs.count(_ == 1).toDouble
    val c50 = math.max(1.0, xs.count(_ == 50).toDouble)
    assert(c1 / c50 > 10, s"rank-1 should dominate rank-50 (got ${c1 / c50})")
  }

  test("attack query matches the planted edges in chronological order only") {
    val q = GraphStreams.attackQuery
    val s = GraphStreams.trafficWithAttack(1200, 20, plantAt = 600)
    val attackEdges = s.filter(e => e.ts >= 600 && e.ts <= 604)
    val m = attackEdges.zip(Seq(1, 2, 3, 4, 5)).map { case (e, qe) => qe -> e }.toMap
    assert(Matching.isValidPartial(q, m))
  }
}
