package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.data.{GraphStreams, QueryGenerator}

class StaticMatcherSpec extends AnyFunSuite {
  import Fixtures._

  private val matchers: Seq[StaticMatcher] = Seq(new QuickSI, new TurboIso, new BoostIso)

  private def structuralBrute(q: QueryGraph, edges: Seq[StreamEdge]): Set[String] = {
    // brute force without timing (static matchers are structure-only)
    val noOrder = QueryGraph(q.vertices, q.edges, Set.empty)
    bruteForce(noOrder, edges)
  }

  for (m <- matchers) {
    test(s"${m.name} finds the paper embedding (structure only)") {
      val emb = paperEmbedding()
      val got = m.findAll(paperQ, emb)
      assert(got.size == 1)
      assert(Matching.vertexBinding(paperQ, got.head).isDefined)
    }

    test(s"${m.name} anchored search returns only matches containing the anchor") {
      val emb = paperEmbedding()
      val got = m.findAll(paperQ, emb, anchor = Some(emb(2)))
      assert(got.nonEmpty)
      assert(got.forall(_.values.exists(_.id == emb(2).id)))
      val none = m.findAll(paperQ, emb, anchor = Some(e(ve, ve + 50, 99)))
      assert(none.isEmpty)
    }

    for (seed <- 1 to 5) {
      test(s"${m.name} equals structural brute force (seed=$seed)") {
        val stream = GraphStreams.wikiTalk(70, 8, seed = seed * 19)
        val q = QueryGenerator.fromStream(stream, 3 + seed % 2, QueryGenerator.RandomOrder, seed, 70)
          .getOrElse(fail("gen failed"))
        val got = m.findAll(q, stream).map(Matching.key).toSet
        assert(got == structuralBrute(q, stream))
      }
    }
  }

  test("all three matchers agree with each other") {
    val stream = GraphStreams.traffic(80, 6, nPorts = 3, seed = 3)
    val q = QueryGenerator.fromStream(stream, 3, QueryGenerator.EmptyOrder, 5, 80)
      .getOrElse(fail("gen failed"))
    val res = matchers.map(_.findAll(q, stream).map(Matching.key).toSet)
    assert(res.distinct.size == 1, s"matchers disagree: ${res.map(_.size)}")
  }

  test("anchored union over all window edges equals the unanchored result") {
    val stream = GraphStreams.wikiTalk(50, 6, seed = 9)
    val q = QueryGenerator.fromStream(stream, 3, QueryGenerator.EmptyOrder, 7, 50)
      .getOrElse(fail("gen failed"))
    val m        = new QuickSI
    val anchored = stream.flatMap(e => m.findAll(q, stream, Some(e))).map(Matching.key).toSet
    val full     = m.findAll(q, stream).map(Matching.key).toSet
    assert(anchored == full)
  }
}
