package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.PropertyGraph

/** Redundancy-Reduction Guidance — the paper's preprocessing product.
  *
  * `level(v)` is the BFS level at which v is first reached from the roots
  * (Alg. 1's `visited`/`dist`), and `lastIter(v)` the last propagation level
  * at which v receives an update from a just-activated in-neighbor, i.e.
  * `1 + max(level(u))` over reachable in-neighbors u.
  *
  * Vertices never reached keep no entry; [[lastIterOf]] maps them to
  * `maxLevel + 1`, a conservative bound: min/max apps merely start them
  * late (the final verification push fixes any remainder) and arithmetic
  * apps practically never freeze them, so correctness is preserved.
  */
final case class RRGuidance(
    level: Map[Long, Int],
    lastIter: Map[Long, Int],
    maxLevel: Int,
    edgeComputations: Long,
    wallMillis: Long,
) {
  def lastIterOf(v: Long): Int = lastIter.getOrElse(v, maxLevel + 1)
  def levelOf(v: Long): Int = level.getOrElse(v, -1)

  /** DataFrame view (id, level, lastIter) for oracle-style checks. */
  def toDF(g: PropertyGraph): DataFrame = {
    val spark = g.spark
    import spark.implicits._
    g.vertexIds.toSeq.map(v => (v, levelOf(v), lastIterOf(v))).toDF("id", "level", "lastiter")
  }
}

object RRGuidance {

  /** Default root set when no application root is given: all pure sources
    * (in-degree 0); if the graph has none, the smallest vertex id.
    */
  def defaultRoots(g: PropertyGraph): Set[Long] = {
    val sources = g.vertexIds.iterator.filter(v => g.inDeg(v) == 0L).toSet
    if (sources.nonEmpty) sources else Set(g.vertexIds.min)
  }

  /** Run Alg. 1: frontier expansion as Spark joins over the distributed edge
    * list; the per-vertex `level`/`lastIter` bookkeeping lives on the driver
    * (same layering as the execution engine). Each reachable vertex enters
    * the frontier exactly once, so total edge work is one pass over the
    * edges reachable from the roots — the paper's "extremely low overhead".
    */
  def generate(g: PropertyGraph, roots: Set[Long]): RRGuidance = {
    val spark = g.spark
    import spark.implicits._
    val t0 = System.nanoTime()
    val level = scala.collection.mutable.Map.empty[Long, Int]
    val last = scala.collection.mutable.Map.empty[Long, Int]
    roots.foreach(r => level(r) = 0)
    var frontier: Array[Long] = roots.toArray.sorted
    var iter = 1
    var comps = 0L
    while (frontier.nonEmpty) {
      val fDf = frontier.toSeq.toDF("fsrc")
      // All edges out of the frontier, aggregated per destination: the count
      // is the edge work of this level, the keys are the touched vertices.
      val touched = g.edges
        .join(broadcast(fDf), col("src") === col("fsrc"))
        .groupBy(col("dst"))
        .agg(count(lit(1)) as "c")
        .as[(Long, Long)]
        .collect()
      comps += touched.iterator.map(_._2).sum
      touched.foreach { case (d, _) => last(d) = iter } // iter only grows
      val newly = touched.iterator.map(_._1).filterNot(level.contains).toArray.sorted
      newly.foreach(d => level(d) = iter)
      frontier = newly
      iter += 1
    }
    val maxLevel = if (level.isEmpty) 0 else level.valuesIterator.max
    RRGuidance(level.toMap, last.toMap, maxLevel, comps,
      (System.nanoTime() - t0) / 1000000L)
  }
}
