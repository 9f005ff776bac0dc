package repro.spark

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

import repro.core.StreamEdge

/** DataFrame schema and conversions for streaming-graph edges. */
object EdgeStreams {

  /** Canonical edge schema shared by every Spark-side component. */
  val schema: StructType = StructType(Seq(
    StructField("id", LongType, nullable = false),
    StructField("src", LongType, nullable = false),
    StructField("src_label", StringType, nullable = false),
    StructField("dst", LongType, nullable = false),
    StructField("dst_label", StringType, nullable = false),
    StructField("label", StringType, nullable = false),
    StructField("ts", LongType, nullable = false),
  ))

  /** Edges as a DataFrame (deterministic row order not required). */
  def toDf(spark: SparkSession, edges: Seq[StreamEdge]): DataFrame = {
    val rows = edges.map(e => Row(e.id, e.src, e.srcLabel, e.dst, e.dstLabel, e.label, e.ts))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 4), schema)
  }

  /** The snapshot at time `t` under window `w`: ts ∈ (t−w, t]. */
  def snapshot(edges: DataFrame, t: Long, w: Long): DataFrame = {
    import org.apache.spark.sql.functions.col
    edges.where(col("ts") > t - w && col("ts") <= t)
  }
}
