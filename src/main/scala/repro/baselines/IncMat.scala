package repro.baselines

import scala.collection.mutable
import repro.core.{EngineApi, Matching, QueryGraph, StreamEdge}

/** IncMat baseline (Fan et al., applied as in §VII-C): keeps the window
  * graph, and on every insertion re-runs a static subgraph-isomorphism
  * search over the *affected area* — the subgraph induced by vertices
  * within `diameter(Q)` hops of the new edge — anchored on the new edge.
  * Timing order is verified posteriorly. Matches are retained only so that
  * expiry can drop them (the method itself maintains no partial results).
  */
final class IncMat(val q: QueryGraph, val matcher: StaticMatcher) extends EngineApi {

  private val windowEdges = mutable.LinkedHashMap[Long, StreamEdge]()
  private val byVertex    = mutable.Map[Long, mutable.Set[Long]]() // vertex -> edge ids
  private val matches     = mutable.LinkedHashMap[String, Matching.Match]()

  private def link(e: StreamEdge): Unit = {
    byVertex.getOrElseUpdate(e.src, mutable.Set()) += e.id
    byVertex.getOrElseUpdate(e.dst, mutable.Set()) += e.id
  }

  private def unlink(e: StreamEdge): Unit =
    Seq(e.src, e.dst).foreach { v =>
      byVertex.get(v).foreach { s => s -= e.id; if (s.isEmpty) byVertex -= v }
    }

  /** Edges of the snapshot induced by vertices within `hops` of σ. */
  private[baselines] def affectedArea(sigma: StreamEdge, hops: Int): IndexedSeq[StreamEdge] = {
    val inArea = mutable.Set[Long](sigma.src, sigma.dst)
    var front  = Set[Long](sigma.src, sigma.dst)
    var h      = 0
    while (h < hops && front.nonEmpty) {
      val next = mutable.Set[Long]()
      front.foreach { v =>
        byVertex.getOrElse(v, mutable.Set()).foreach { eid =>
          val e = windowEdges(eid)
          Seq(e.src, e.dst).foreach(w => if (inArea.add(w)) next += w)
        }
      }
      front = next.toSet
      h += 1
    }
    windowEdges.valuesIterator.filter(e => inArea(e.src) && inArea(e.dst)).toIndexedSeq
  }

  override def insert(sigma: StreamEdge): Vector[Matching.Match] = {
    windowEdges(sigma.id) = sigma
    link(sigma)
    if (q.matchingQueryEdges(sigma).isEmpty) return Vector.empty
    val area       = affectedArea(sigma, q.diameter)
    val structural = matcher.findAll(q, area, anchor = Some(sigma))
    val out        = Vector.newBuilder[Matching.Match]
    structural.foreach { m =>
      if (Matching.timingOk(q, m)) {
        val key = Matching.key(m)
        if (!matches.contains(key)) { matches(key) = m; out += m }
      }
    }
    out.result()
  }

  override def delete(sigma: StreamEdge): Unit = {
    windowEdges.remove(sigma.id).foreach(unlink)
    matches.filterInPlace { case (_, m) => !m.values.exists(_.id == sigma.id) }
  }

  override def results: Vector[Matching.Match] = matches.values.toVector

  /** Window adjacency (2 cells per edge) + maintained results. */
  override def spaceCells: Long =
    2L * windowEdges.size + matches.size.toLong * q.edges.size
}
