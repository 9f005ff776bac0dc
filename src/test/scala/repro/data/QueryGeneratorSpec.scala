package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class QueryGeneratorSpec extends AnyFunSuite {

  private val stream = GraphStreams.wikiTalk(3000, 60, seed = 4)

  test("generated queries are valid, connected, and of the requested size") {
    var got = 0
    (1 to 20).foreach { seed =>
      QueryGenerator.fromStream(stream, 5, QueryGenerator.RandomOrder, seed, 300).foreach { q =>
        got += 1
        assert(q.edges.size == 5)
        assert(q.isWeaklyConnected(q.edges.map(_.id).toSet))
        // strict partial order (already validated by the constructor)
        q.order.foreach { case (a, b) => assert(!q.precedes(b, a)) }
      }
    }
    assert(got >= 15, s"generation should usually succeed (got $got/20)")
  }

  test("full-order queries have a total timing order") {
    val q = QueryGenerator.fromStream(stream, 5, QueryGenerator.FullOrder, 3, 300).get
    val ids = q.edges.map(_.id)
    ids.combinations(2).foreach { case Seq(a, b) =>
      assert(q.precedes(a, b) || q.precedes(b, a))
    }
  }

  test("empty-order queries have no timing constraints") {
    val q = QueryGenerator.fromStream(stream, 5, QueryGenerator.EmptyOrder, 3, 300).get
    assert(q.order.isEmpty)
  }

  test("generated queries have an embedding in the stream (the paper's guarantee)") {
    (1 to 8).foreach { seed =>
      QueryGenerator.fromStream(stream, 4, QueryGenerator.RandomOrder, seed, 250).foreach { q =>
        // brute force over the whole stream restricted to one window span;
        // the walk stayed inside one window slice, so a match must exist
        // in at least one window position — check the generous superset.
        val found = Fixtures.bruteForce(q, stream)
        assert(found.nonEmpty, s"seed=$seed: generated query has no embedding at all")
      }
    }
  }

  test("withDecompositionSize hits the requested k") {
    for (k <- Seq(1, 2, 4)) {
      QueryGenerator.withDecompositionSize(stream, 4, k, seed = 6, windowSpan = 300) match {
        case Some(q) => assert(Decomposer.decompose(q).k == k, s"k=$k")
        case None    => fail(s"could not generate k=$k query")
      }
    }
  }

  test("querySet produces the per-graph order variants") {
    val qs = QueryGenerator.querySet(stream, 4, nGraphs = 3, windowSpan = 300, seed = 10)
    assert(qs.size >= 6, s"expected ≥2 variants per graph, got ${qs.size}")
    assert(qs.forall(_.edges.size == 4))
    assert(qs.exists(_.order.isEmpty), "an empty-order variant exists")
    assert(qs.exists { q =>
      val ids = q.edges.map(_.id)
      ids.combinations(2).forall { case Seq(a, b) => q.precedes(a, b) || q.precedes(b, a) }
    }, "a full-order variant exists")
  }

  test("generation is deterministic in the seed") {
    val a = QueryGenerator.fromStream(stream, 4, QueryGenerator.RandomOrder, 12, 300)
    val b = QueryGenerator.fromStream(stream, 4, QueryGenerator.RandomOrder, 12, 300)
    assert(a.map(_.toString) == b.map(_.toString))
  }
}
