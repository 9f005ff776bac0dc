package repro.core

import scala.collection.mutable
import scala.util.Random

/** Join-order selection over a TC decomposition (§VI-C).
  *
  * The heuristic greedily builds a prefix-connected permutation maximising
  * the *joint number* (Definition 12) between the already-joined prefix and
  * the next subquery: `JN = |shared vertices| + |cross timing-order pairs|`.
  */
object JoinOrder {

  /** Joint number between two edge sets (Definition 12). */
  def jointNumber(q: QueryGraph, a: Set[Int], b: Set[Int]): Int = {
    def verts(s: Set[Int]): Set[Int] =
      s.flatMap(e => Set(q.edgeById(e).src, q.edgeById(e).dst))
    val nv = (verts(a) & verts(b)).size
    val nt = (for (x <- a; y <- b if q.precedes(x, y) || q.precedes(y, x)) yield (x, y)).size
    nv + nt
  }

  private def connected(q: QueryGraph, a: Set[Int], b: Set[Int]): Boolean =
    q.isWeaklyConnected(a ++ b)

  /** Paper heuristic: start from the connected pair with max joint number,
    * then repeatedly append the connected subquery with max joint number
    * versus the current prefix. Deterministic tie-break by sequence text.
    */
  def order(q: QueryGraph, subs: Vector[TcSubquery]): IndexedSeq[TcSubquery] = {
    if (subs.size <= 1) return subs
    def key(s: TcSubquery) = s.seq.mkString(",")
    val remaining = mutable.ArrayBuffer[TcSubquery](subs.sortBy(key): _*)
    val out       = mutable.ArrayBuffer[TcSubquery]()
    // Best connected starting pair.
    var best: (TcSubquery, TcSubquery) = null
    var bestJn                         = -1
    for (i <- subs.indices; j <- subs.indices if i != j) {
      val (a, b) = (subs(i), subs(j))
      if (connected(q, a.edgeSet, b.edgeSet)) {
        val jn = jointNumber(q, a.edgeSet, b.edgeSet)
        val tieBreak = best != null && jn == bestJn &&
          Ordering.Tuple2[String, String].lt((key(a), key(b)), (key(best._1), key(best._2)))
        if (jn > bestJn || tieBreak) {
          bestJn = jn; best = (a, b)
        }
      }
    }
    require(best != null, "no connected pair — Q should be weakly connected")
    out += best._1 += best._2
    remaining -= best._1 -= best._2
    while (remaining.nonEmpty) {
      val prefix = out.flatMap(_.edgeSet).toSet
      val next = remaining
        .filter(s => connected(q, prefix, s.edgeSet))
        .maxByOption(s => (jointNumber(q, prefix, s.edgeSet), key(s)))
        .getOrElse(remaining.head)
      out += next
      remaining -= next
    }
    out.toIndexedSeq
  }

  /** Timing-RJ ablation: a uniformly random prefix-connected permutation. */
  def randomOrder(q: QueryGraph, subs: Vector[TcSubquery], seed: Long): IndexedSeq[TcSubquery] = {
    if (subs.size <= 1) return subs
    val rnd       = new Random(seed)
    val remaining = mutable.ArrayBuffer[TcSubquery](subs: _*)
    val out       = mutable.ArrayBuffer[TcSubquery]()
    out += remaining.remove(rnd.nextInt(remaining.size))
    while (remaining.nonEmpty) {
      val prefix     = out.flatMap(_.edgeSet).toSet
      val candidates = remaining.zipWithIndex.filter { case (s, _) => connected(q, prefix, s.edgeSet) }
      val (_, idx)   = if (candidates.nonEmpty) candidates(rnd.nextInt(candidates.size)) else (remaining.head, 0)
      out += remaining.remove(idx)
    }
    out.toIndexedSeq
  }
}
