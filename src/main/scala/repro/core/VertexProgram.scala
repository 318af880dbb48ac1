package repro.core

import org.apache.spark.sql.Column

/** The aggregation-function class of a graph application (paper Table 1):
  * comparison (min/max) apps admit "start late", arithmetic (sum) apps
  * admit "finish early".
  */
sealed trait AggKind
object AggKind {
  case object Min extends AggKind
  case object Max extends AggKind
  case object Sum extends AggKind
}

/** A user-defined vertex program, the SLFE analogue of the paper's
  * (pushFunc, pullFunc, vertexFunc) triple (Table 3, Alg. 4/5).
  *
  * `msg` is a Catalyst expression evaluated per edge inside the Spark plan
  * (srcValue, edgeWeight, srcOutDegree) — the distributed, heavy part.
  * `applyFn`/`improves` are the per-vertex master-side apply step, plain
  * Scala over the aggregated message, like a Pregel master compute.
  *
  * @param agg       aggregation combining all messages into a vertex
  * @param arith     true for arithmetic (finish-early) applications
  * @param initValue initial vertex property
  * @param initActive initially active vertices (e.g. the SSSP root)
  * @param msg       per-edge message: (srcVal, weight, srcOutDeg) => Column
  * @param applyFn   (aggregatedMsg, oldValue) => candidate new value
  * @param improves  (candidate, oldValue) => does this change the vertex
  *                  (min/max: strict improvement; arith: |delta| > eps)
  * @param noMsgAgg  aggregate used when a computed vertex receives no
  *                  message (Sum identity 0; min/max apps skip instead)
  * @param eps       stability epsilon for arithmetic apps
  */
final case class VertexProgram(
    name: String,
    agg: AggKind,
    arith: Boolean,
    initValue: Long => Double,
    initActive: Long => Boolean,
    msg: (Column, Column, Column) => Column,
    applyFn: (Double, Double) => Double,
    improves: (Double, Double) => Boolean,
    noMsgAgg: Double,
    eps: Double = 1e-9,
)
