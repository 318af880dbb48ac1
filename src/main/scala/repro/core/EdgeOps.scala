package repro.core

import org.apache.spark.sql.functions._
import repro.graph.PropertyGraph

/** One vertex's mutable state during an engine run. */
final case class VState(
    id: Long,
    value: Double,
    active: Boolean,
    stableCnt: Int,
    lastIter: Int,
    outDeg: Long,
)

/** The distributed half of every engine: message generation over the edge
  * DataFrame and aggregation per destination, as a Catalyst plan
  * (broadcast-hash join of edges with the small vertex-state relation,
  * then `groupBy(dst).agg(min|max|sum)`).
  */
private[repro] object EdgeOps {

  /** Aggregate messages into destinations.
    *
    * @param srcs (id, value, outDeg) of message *sources* (pull: everyone,
    *             per the paper pull must read all predecessors; push: the
    *             active list)
    * @param dsts destinations to compute, or None for "all destinations"
    * @return per-destination (aggregatedMessage, edgesProcessed)
    */
  def aggregate(g: PropertyGraph, prog: VertexProgram,
                srcs: Seq[(Long, Double, Long)],
                dsts: Option[Seq[Long]]): Map[Long, (Double, Long)] = {
    if (srcs.isEmpty || dsts.exists(_.isEmpty)) return Map.empty
    val spark = g.spark
    import spark.implicits._
    val srcDf = srcs.toDF("msrc", "srcVal", "srcOutDeg")
    var msgs = g.edges.join(broadcast(srcDf), col("src") === col("msrc"))
    dsts.foreach { ids =>
      val dstDf = ids.toDF("mdst")
      msgs = msgs.join(broadcast(dstDf), col("dst") === col("mdst"))
    }
    val m = prog.msg(col("srcVal"), col("weight"), col("srcOutDeg"))
    val aggCol = prog.agg match {
      case AggKind.Min => min(m)
      case AggKind.Max => max(m)
      case AggKind.Sum => sum(m)
    }
    msgs.groupBy(col("dst"))
      .agg(aggCol as "m", count(lit(1)) as "c")
      .as[(Long, Double, Long)]
      .collect()
      .iterator
      .map { case (d, mm, cc) => d -> (mm, cc) }
      .toMap
  }

  /** Initial engine state for a program over a graph, with RRG attached
    * (lastIter = 0 everywhere when no guidance is used).
    */
  def initState(g: PropertyGraph, prog: VertexProgram, rrg: Option[RRGuidance]): Array[VState] =
    g.vertexIds.map { v =>
      VState(v, prog.initValue(v), prog.initActive(v), 0,
        rrg.map(_.lastIterOf(v)).getOrElse(0), g.outDeg(v))
    }
}
