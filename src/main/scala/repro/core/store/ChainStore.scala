package repro.core.store

import repro.core.StreamEdge

/** A stored (partial) match handed out by a store: `ref` identifies the
  * stored representation (MS-tree node / independent record) and `edges`
  * is the materialized sequential form, aligned with the item's query-edge
  * sequence.
  */
final case class StoredMatch(ref: AnyRef, edges: IndexedSeq[StreamEdge])

/** Storage for one expansion list `L = {L^1..L^k}` over a TC-subquery's
  * timing sequence (§III-A3). Items are 0-based here: item `j` holds the
  * matches of the prerequisite subquery of the `(j+1)`-th sequence edge.
  *
  * Implementations: [[MsChainStore]] (MS-tree, §IV) and [[IndChainStore]]
  * (independent match storage — the Timing-IND ablation).
  */
trait ChainStore {

  /** Query-edge ids in timing-sequence order. */
  def seq: IndexedSeq[Int]

  /** Number of items (= |seq|). */
  final def k: Int = seq.length

  /** Ω(L^{j+1}): live matches of item `j` (materialized snapshot). */
  def read(j: Int): Vector[StoredMatch]

  /** Insert σ as a new match of item 0 (Theorem 2 case 1). */
  def insertRoot(sigma: StreamEdge): StoredMatch

  /** Extend `parent` (a match of item `j-1`) with σ into item `j`
    * (Theorem 2 case 2); O(1) — no path re-traversal (§IV-B).
    */
  def extend(j: Int, parent: StoredMatch, sigma: StreamEdge): StoredMatch

  /** Start an expiry pass for σ, which matches the sequence at the given
    * 0-based positions. The caller must invoke `processLevel(j)` for
    * j = 0..k-1 in order (each under the item's X lock when concurrent).
    */
  def newExpiry(sigma: StreamEdge, triggers: Set[Int]): ChainExpiry

  /** Number of live matches in item `j`. */
  def size(j: Int): Int

  /** Space in cells (see DESIGN.md §5, space accounting). */
  def spaceCells: Long

  /** Liveness of a complete-match ref (used by the L0 MS-tree). */
  def isLive(ref: AnyRef): Boolean

  /** Materialize a complete match (item k-1) from its ref. */
  def materialize(ref: AnyRef): IndexedSeq[StreamEdge]
}

/** Level-stepped expiry cursor (Algorithm 2, restructured so each level's
  * work happens under that item's lock — required by §V-C).
  */
trait ChainExpiry {

  /** Remove expired matches at level `j`; returns how many were removed. */
  def processLevel(j: Int): Int

  /** Complete matches (last level) removed so far by this pass. */
  def removedCompleteCount: Int
}
