package repro.spark

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.core.{QueryGraph, TimingSequence}

/** Declarative time-constrained subgraph matching over a snapshot
  * DataFrame — the Catalyst reference implementation.
  *
  * One self-join per query edge in a prefix-connected order, with label
  * filters, shared-vertex equality, vertex-injectivity and data-edge
  * distinctness inequalities, and timestamp predicates for every `≺` pair
  * (Definition 4 expressed relationally). Output: one row per match, one
  * `m_<queryEdgeId>` column carrying the bound data-edge id.
  */
object SnapshotMatcher {

  /** Deterministic prefix-connected build order (ignores timing). */
  def buildOrder(q: QueryGraph): IndexedSeq[Int] = TimingSequence.connectivityOrder(q)

  private def renamed(edges: DataFrame, p: Int): DataFrame =
    edges.select(edges.columns.map(c => col(c).as(s"e${p}_$c")).toIndexedSeq: _*)

  /** All time-constrained matches of `q` in `edges` (a snapshot). */
  def matches(edges: DataFrame, q: QueryGraph): DataFrame = {
    val order = buildOrder(q)
    // query vertex -> column name binding it, established left-to-right
    var bound: Map[Int, String] = Map.empty
    var df: DataFrame           = null

    order.zipWithIndex.foreach { case (qeid, p) =>
      val qe   = q.edgeById(qeid)
      val side = renamed(edges, p)
      val preds = scala.collection.mutable.ArrayBuffer[Column]()
      // label filters (wildcard "*" imposes none)
      if (qe.label != "*") preds += col(s"e${p}_label") === lit(qe.label)
      if (q.label(qe.src) != "*") preds += col(s"e${p}_src_label") === lit(q.label(qe.src))
      if (q.label(qe.dst) != "*") preds += col(s"e${p}_dst_label") === lit(q.label(qe.dst))
      // no self-loops on the data side (query graphs have none)
      preds += col(s"e${p}_src") =!= col(s"e${p}_dst")

      if (p == 0) {
        df = side.where(preds.reduce(_ && _))
      } else {
        // vertex consistency / injectivity against the bound prefix
        Seq(qe.src -> s"e${p}_src", qe.dst -> s"e${p}_dst").foreach { case (qv, c) =>
          bound.foreach { case (bqv, bc) =>
            if (bqv == qv) preds += col(bc) === col(c)
            else preds += col(bc) =!= col(c)
          }
        }
        // data-edge distinctness + timing predicates vs earlier positions
        (0 until p).foreach { pp =>
          val prevId = order(pp)
          preds += col(s"e${pp}_id") =!= col(s"e${p}_id")
          if (q.precedes(prevId, qeid)) preds += col(s"e${pp}_ts") < col(s"e${p}_ts")
          if (q.precedes(qeid, prevId)) preds += col(s"e${p}_ts") < col(s"e${pp}_ts")
        }
        df = df.join(side, preds.reduce(_ && _))
      }
      if (!bound.contains(qe.src)) bound += qe.src -> s"e${p}_src"
      if (!bound.contains(qe.dst)) bound += qe.dst -> s"e${p}_dst"
    }

    val outCols = q.edges.map(_.id).sorted.map { qeid =>
      val p = order.indexOf(qeid)
      col(s"e${p}_id").as(s"m_$qeid")
    }
    df.select(outCols.toIndexedSeq: _*)
  }
}
