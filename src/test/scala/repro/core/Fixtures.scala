package repro.core

import scala.collection.mutable

/** Shared test fixtures: the paper's running example reconstructed to the
  * letter, tiny stream builders, and an independent brute-force reference
  * matcher.
  */
object Fixtures {

  /** The running-example query Q (Fig 5), reconstructed so that all the
    * paper's stated derived structures hold exactly:
    *   - `TCsub(Q)` is the 10 subqueries listed in §VI-B:
    *     {ε6ε5ε4}, {ε3ε1}, {ε6ε5}, {ε5ε4}, and the 6 singletons;
    *   - the greedy decomposition is {ε6ε5ε4}, {ε3ε1}, {ε2} (Fig 9).
    *
    * Vertices: a..f labelled A..F; edges ε6:a→b, ε5:b→c, ε4:c→d, ε3:e→f,
    * ε1:f→a, ε2:d→b. Timing: ε3≺ε1≺ε2, ε6≺ε5≺ε4 (closure adds ε3≺ε2, ε6≺ε4).
    */
  val paperQ: QueryGraph = QueryGraph(
    vertices = Seq(
      QueryVertex(0, "A"), QueryVertex(1, "B"), QueryVertex(2, "C"),
      QueryVertex(3, "D"), QueryVertex(4, "E"), QueryVertex(5, "F"),
    ),
    edges = Seq(
      QueryEdge(1, 5, 0, "-"), // ε1: f→a
      QueryEdge(2, 3, 1, "-"), // ε2: d→b
      QueryEdge(3, 4, 5, "-"), // ε3: e→f
      QueryEdge(4, 2, 3, "-"), // ε4: c→d
      QueryEdge(5, 1, 2, "-"), // ε5: b→c
      QueryEdge(6, 0, 1, "-"), // ε6: a→b
    ),
    orderPairs = Set((3, 1), (1, 2), (6, 5), (5, 4)),
  )

  /** Data vertex ids for one embedding of [[paperQ]] (labels A..F). */
  val (va, vb, vc, vd, ve, vf) = (10L, 11L, 12L, 13L, 14L, 15L)

  private var nextId = 1000L

  /** Data edge with labels derived from a fixed vertex-label table. */
  def e(src: Long, dst: Long, ts: Long, label: String = "-"): StreamEdge = {
    def lbl(v: Long): String = v match {
      case `va` => "A"; case `vb` => "B"; case `vc` => "C"
      case `vd` => "D"; case `ve` => "E"; case `vf` => "F"
      case x    => ('G' + (x % 20).toInt).toChar.toString
    }
    nextId += 1
    StreamEdge(nextId, src, lbl(src), dst, lbl(dst), label, ts)
  }

  /** Edges of one full embedding of [[paperQ]], in a timing-valid arrival
    * order: ε6(t1) ε3(t2) ε5(t3) ε1(t4) ε4(t5) ε2(t6).
    */
  def paperEmbedding(t0: Long = 0): Vector[StreamEdge] = Vector(
    e(va, vb, t0 + 1), // matches ε6
    e(ve, vf, t0 + 2), // matches ε3
    e(vb, vc, t0 + 3), // matches ε5
    e(vf, va, t0 + 4), // matches ε1
    e(vc, vd, t0 + 5), // matches ε4
    e(vd, vb, t0 + 6), // matches ε2
  )

  /** Independent brute-force reference: enumerate assignments of window
    * edges to query edges in ascending query-edge-id order (no clever
    * ordering/pruning — deliberately different from every system under
    * test) and keep the valid time-constrained matches.
    */
  def bruteForce(q: QueryGraph, window: Seq[StreamEdge]): Set[String] = {
    val qeIds = q.edges.map(_.id).sorted
    val out   = mutable.Set[String]()
    val edges = window.toIndexedSeq
    def rec(depth: Int, ids: Vector[Int], es: Vector[StreamEdge]): Unit = {
      if (depth == qeIds.length) { out += Matching.key(ids.zip(es).toMap); return }
      val qeid = qeIds(depth)
      edges.foreach { cand =>
        if (Matching.canExtend(q, ids, es, qeid, cand))
          rec(depth + 1, ids :+ qeid, es :+ cand)
      }
    }
    rec(0, Vector.empty, Vector.empty)
    out.toSet
  }

  /** Result keys of an engine's current answers. */
  def keys(ms: Seq[Matching.Match]): Set[String] = ms.map(Matching.key).toSet
}
