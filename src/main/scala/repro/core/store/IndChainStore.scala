package repro.core.store

import scala.collection.mutable
import repro.core.StreamEdge

/** A match stored independently (full sequential form, no prefix sharing). */
final class IndMatch(val edges: IndexedSeq[StreamEdge]) {
  @volatile var alive: Boolean = true
  def contains(edgeId: Long): Boolean = edges.exists(_.id == edgeId)
}

/** Independent-storage expansion list — the Timing-IND ablation (§VII-C):
  * every partial match materializes its whole edge sequence, so space is
  * Σ match lengths and expiry scans each item (no prefix sharing, no O(1)
  * subtree deletion).
  */
final class IndChainStore(val seq: IndexedSeq[Int]) extends ChainStore {

  private val items: Array[mutable.ArrayBuffer[IndMatch]] =
    Array.fill(seq.length)(mutable.ArrayBuffer())

  override def read(j: Int): Vector[StoredMatch] =
    items(j).iterator.map(m => StoredMatch(m, m.edges)).toVector

  override def insertRoot(sigma: StreamEdge): StoredMatch = {
    val m = new IndMatch(Vector(sigma))
    items(0) += m
    StoredMatch(m, m.edges)
  }

  override def extend(j: Int, parent: StoredMatch, sigma: StreamEdge): StoredMatch = {
    val m = new IndMatch(parent.edges :+ sigma)
    items(j) += m
    StoredMatch(m, m.edges)
  }

  override def newExpiry(sigma: StreamEdge, triggers: Set[Int]): ChainExpiry =
    new ChainExpiry {
      private var completes = 0

      override def processLevel(j: Int): Int = {
        var removed = 0
        items(j).filterInPlace { m =>
          val expired = m.contains(sigma.id)
          if (expired) { m.alive = false; removed += 1 }
          !expired
        }
        if (j == seq.length - 1) completes += removed
        removed
      }

      override def removedCompleteCount: Int = completes
    }

  override def size(j: Int): Int = items(j).size

  override def spaceCells: Long =
    items.iterator.map(buf => buf.iterator.map(_.edges.length.toLong).sum).sum

  override def isLive(ref: AnyRef): Boolean = ref.asInstanceOf[IndMatch].alive

  override def materialize(ref: AnyRef): IndexedSeq[StreamEdge] =
    ref.asInstanceOf[IndMatch].edges
}
