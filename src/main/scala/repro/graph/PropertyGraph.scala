package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Immutable directed property graph over a Spark `DataFrame` of edges.
  *
  * Schema: `src: Long, dst: Long, weight: Double`. The vertex set is the set
  * of distinct edge endpoints (real-world graph datasets are edge lists;
  * isolated vertices carry no information for any of the five applications).
  *
  * Edge traversal stays distributed (Spark SQL); small per-vertex metadata
  * (ids, degrees, out-adjacency) is collected once and memoised on the
  * driver. This mirrors Gemini's layering — dense in-memory vertex arrays
  * with distributed edge processing — which SLFE inherits (paper §3.1).
  */
final case class PropertyGraph(edges: DataFrame, name: String = "g") {

  lazy val spark: SparkSession = edges.sparkSession

  /** Distinct vertex ids, ascending. */
  lazy val vertexIds: Array[Long] = {
    import spark.implicits._
    edges.select($"src").union(edges.select($"dst")).distinct().as[Long].collect().sorted
  }

  lazy val numVertices: Long = vertexIds.length.toLong
  lazy val numEdges: Long = edges.count()

  /** Out-degree per vertex (0 for pure sinks). */
  lazy val outDeg: Map[Long, Long] = degreeMap("src")

  /** In-degree per vertex (0 for pure sources). */
  lazy val inDeg: Map[Long, Long] = degreeMap("dst")

  private def degreeMap(endpoint: String): Map[Long, Long] = {
    import spark.implicits._
    val m = edges.groupBy(col(endpoint)).count().as[(Long, Long)].collect().toMap
    vertexIds.iterator.map(v => v -> m.getOrElse(v, 0L)).toMap
  }

  /** Driver-side out-adjacency — bookkeeping for baseline signal sets; the
    * compute path (gather/scatter) always goes through Spark joins.
    */
  lazy val outNbrs: Map[Long, Array[Long]] = {
    import spark.implicits._
    val m = edges.select($"src", $"dst").as[(Long, Long)].collect()
      .groupBy(_._1).map { case (s, arr) => s -> arr.map(_._2) }
    vertexIds.iterator.map(v => v -> m.getOrElse(v, Array.empty[Long])).toMap
  }

  /** Vertex ids as a single-column DataFrame (for oracle queries). */
  def vertices: DataFrame = {
    import spark.implicits._
    vertexIds.toSeq.toDF("id")
  }

  /** Out-degrees as a DataFrame (sinks omitted), for oracle checks. */
  def outDegrees: DataFrame = edges.groupBy(col("src") as "id").agg(count(lit(1)) as "deg")

  /** In-degrees as a DataFrame (sources omitted), for oracle checks. */
  def inDegrees: DataFrame = edges.groupBy(col("dst") as "id").agg(count(lit(1)) as "deg")

  /** Highest-out-degree vertex, smallest id on ties — the bench root. */
  lazy val maxOutDegVertex: Long = vertexIds.minBy(v => (-outDeg(v), v))

  /** Undirected view: original plus reversed edges, de-duplicated.
    * Weights ride along (CC ignores them; symmetric pairs keep both rows
    * only if their weights differ, which is harmless for min/max apps).
    */
  def symmetrize: PropertyGraph = {
    val rev = edges.select(col("dst") as "src", col("src") as "dst", col("weight"))
    PropertyGraph(edges.select("src", "dst", "weight").unionByName(rev).distinct(), name + "-sym")
  }

  /** Materialise and pin the edge list; returns `this` for chaining. */
  def cached(): PropertyGraph = { edges.persist(); edges.count(); this }

  def unpersist(): Unit = { edges.unpersist(); () }
}
