package repro.spark

import repro.core.QueryGraph

/** Generates the DuckDB SQL equivalent of [[SnapshotMatcher.matches]], for
  * `repro.Oracle.assertEquivalent`. The oracle stores every column as
  * VARCHAR, so timestamp comparisons cast explicitly.
  */
object MatchSql {

  /** SELECT returning one row per time-constrained match of `q` over the
    * edge table `table` (schema = [[EdgeStreams.schema]], all VARCHAR),
    * with columns `m_<queryEdgeId>` in ascending query-edge-id order.
    * Optional window bounds filter `lo < ts <= hi`.
    */
  def matchesSql(q: QueryGraph, table: String, window: Option[(Long, Long)] = None): String = {
    val order = SnapshotMatcher.buildOrder(q)
    val preds = scala.collection.mutable.ArrayBuffer[String]()
    var bound = Map[Int, String]()

    order.zipWithIndex.foreach { case (qeid, p) =>
      val qe = q.edgeById(qeid)
      val a  = s"e$p"
      if (qe.label != "*") preds += s"$a.label = '${qe.label}'"
      if (q.label(qe.src) != "*") preds += s"$a.src_label = '${q.label(qe.src)}'"
      if (q.label(qe.dst) != "*") preds += s"$a.dst_label = '${q.label(qe.dst)}'"
      preds += s"$a.src <> $a.dst"
      window.foreach { case (lo, hi) =>
        preds += s"CAST($a.ts AS BIGINT) > $lo AND CAST($a.ts AS BIGINT) <= $hi"
      }
      Seq(qe.src -> s"$a.src", qe.dst -> s"$a.dst").foreach { case (qv, c) =>
        bound.foreach { case (bqv, bc) =>
          preds += (if (bqv == qv) s"$bc = $c" else s"$bc <> $c")
        }
        if (!bound.contains(qv)) bound += qv -> c
      }
      (0 until p).foreach { pp =>
        val prevId = order(pp)
        preds += s"e$pp.id <> $a.id"
        if (q.precedes(prevId, qeid))
          preds += s"CAST(e$pp.ts AS BIGINT) < CAST($a.ts AS BIGINT)"
        if (q.precedes(qeid, prevId))
          preds += s"CAST($a.ts AS BIGINT) < CAST(e$pp.ts AS BIGINT)"
      }
    }

    val selects = q.edges.map(_.id).sorted.map { qeid =>
      val p = order.indexOf(qeid)
      s"e$p.id AS m_$qeid"
    }
    val from = order.indices.map(p => s"$table e$p").mkString(", ")
    s"SELECT ${selects.mkString(", ")} FROM $from WHERE ${preds.mkString(" AND ")}"
  }
}
