package repro.core

/** A timestamped directed edge of the streaming graph (Definition 1).
  *
  * Timestamps are unique and strictly increasing along the stream, so the
  * timing order between any two data edges is unambiguous. Vertex labels
  * ride on the edge (`srcLabel`/`dstLabel`) so a single record is
  * self-contained; generators guarantee a vertex id always carries the
  * same label.
  *
  * @param id       unique edge id (stream position works fine)
  * @param src      source vertex id
  * @param srcLabel label of the source vertex
  * @param dst      destination vertex id
  * @param dstLabel label of the destination vertex
  * @param label    edge label (the paper folds edge labels into imaginary
  *                 vertices; we support them directly, as §II permits)
  * @param ts       arrival timestamp (unique per Definition 1)
  */
final case class StreamEdge(
    id: Long,
    src: Long,
    srcLabel: String,
    dst: Long,
    dstLabel: String,
    label: String,
    ts: Long,
)

object StreamEdge {

  /** Label match with `*` wildcard on the query side (used by the traffic
    * encoding, which wildcards the source port inside the edge label).
    */
  def labelMatches(queryLabel: String, dataLabel: String): Boolean =
    queryLabel == "*" || queryLabel == dataLabel
}
