package repro.baseline

import scala.collection.mutable.ArrayBuffer
import repro.core._
import repro.graph.PropertyGraph

/** Synchronous gather-apply-scatter baselines standing in for the paper's
  * two comparison systems (Table 5):
  *
  * - **PowerG** (`dense = true`): PowerGraph-like — every iteration gathers
  *   *every* vertex over all its in-edges and scatters every out-edge
  *   without change detection (no active-vertex tracking, cf. the paper's
  *   SPARK-3427 citation). The most redundant baseline.
  * - **PowerL** (`dense = false`): PowerLyra-like active-list GAS — only
  *   vertices signaled by an updated in-neighbor are gathered, and only
  *   updated vertices scatter.
  *
  * Gather runs through the same Spark aggregation path as the SLFE engine
  * (`EdgeOps.aggregate`), so computation counts are directly comparable;
  * scatter edge counts are added to the per-iteration computation tally.
  */
object GasEngine {

  /** Min/max applications: iterate to the Bellman-Ford fixpoint. */
  def runMinMax(g: PropertyGraph, prog: VertexProgram, dense: Boolean,
                maxIters: Int = 300): RunResult = {
    val system = if (dense) "PowerG" else "PowerL"
    var state = EdgeOps.initState(g, prog, None)
    val stats = ArrayBuffer.empty[IterationStat]
    val t0 = System.nanoTime()
    var iter = 0
    var done = false
    var signaled: Set[Long] =
      if (dense) Set.empty // unused
      else {
        val act = state.iterator.filter(_.active).map(_.id).toSet
        act ++ act.iterator.flatMap(g.outNbrs(_).iterator)
      }
    while (!done && iter < maxIters) {
      iter += 1
      val it0 = System.nanoTime()
      val srcs = state.iterator.map(v => (v.id, v.value, v.outDeg)).toSeq
      val dsts = if (dense) None else Some(signaled.toSeq)
      val aggMap = EdgeOps.aggregate(g, prog, srcs, dsts)
      var updatedIds = List.empty[Long]
      state = state.map { v =>
        aggMap.get(v.id) match {
          case Some((m, _)) =>
            val cand = prog.applyFn(m, v.value)
            if (prog.improves(cand, v.value)) { updatedIds ::= v.id; v.copy(value = cand, active = true) }
            else v.copy(active = false)
          case None => v.copy(active = false)
        }
      }
      val updates = updatedIds.size.toLong
      val gatherComps = aggMap.valuesIterator.map(_._2).sum
      val scatterComps =
        if (dense) g.numEdges // change-blind scatter over every edge
        else updatedIds.iterator.map(g.outDeg(_)).sum
      val computed = if (dense) g.numVertices else signaled.size.toLong
      stats += IterationStat(iter, if (dense) "gas-dense" else "gas-signaled",
        computed, gatherComps + scatterComps, updates, updates,
        (System.nanoTime() - it0) / 1000000L)
      if (!dense) signaled = updatedIds.iterator.flatMap(g.outNbrs(_).iterator).toSet
      done = if (dense) updates == 0 else signaled.isEmpty
    }
    require(done, s"$system/${prog.name} on ${g.name} hit maxIters=$maxIters before converging")
    RunResult(system, prog.name, g.name,
      state.iterator.map(v => v.id -> v.value).toMap, stats.toSeq,
      (System.nanoTime() - t0) / 1000000L)
  }

  /** Arithmetic applications: both variants gather *every* vertex each
    * iteration — PR-family engines in PowerGraph/PowerLyra are static
    * all-active programs (the paper's SPARK-3427 citation: no active-vertex
    * tracking). They differ in scatter accounting: PowerG scatters every
    * edge change-blind; PowerL scatters only changed vertices' out-edges.
    * With `earlyStop` both exit once no vertex changes.
    */
  def runArith(g: PropertyGraph, prog: VertexProgram, dense: Boolean,
               iters: Int = 30, earlyStop: Boolean = false): RunResult = {
    val system = if (dense) "PowerG" else "PowerL"
    var state = EdgeOps.initState(g, prog, None)
    val stats = ArrayBuffer.empty[IterationStat]
    val t0 = System.nanoTime()
    var iter = 0
    var done = false
    while (!done && iter < iters) {
      iter += 1
      val it0 = System.nanoTime()
      val srcs = state.iterator.map(v => (v.id, v.value, v.outDeg)).toSeq
      val aggMap = EdgeOps.aggregate(g, prog, srcs, None)
      var updatedIds = List.empty[Long]
      state = state.map { v =>
        val m = aggMap.get(v.id).map(_._1).getOrElse(prog.noMsgAgg)
        val cand = prog.applyFn(m, v.value)
        val changed = prog.improves(cand, v.value)
        if (changed) updatedIds ::= v.id
        v.copy(value = cand, active = changed)
      }
      val updates = updatedIds.size.toLong
      val gatherComps = aggMap.valuesIterator.map(_._2).sum
      val scatterComps =
        if (dense) g.numEdges
        else updatedIds.iterator.map(g.outDeg(_)).sum
      stats += IterationStat(iter, if (dense) "gas-dense" else "gas-signaled",
        g.numVertices, gatherComps + scatterComps, updates, updates,
        (System.nanoTime() - it0) / 1000000L)
      if (earlyStop && updates == 0) done = true
    }
    RunResult(system, prog.name, g.name,
      state.iterator.map(v => v.id -> v.value).toMap, stats.toSeq,
      (System.nanoTime() - t0) / 1000000L)
  }
}
