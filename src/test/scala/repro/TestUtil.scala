package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.scalacheck.{Prop, Test => SCTest}
import repro.graph.PropertyGraph

/** Shared helpers for the test suites: ScalaCheck runner (scalatestplus is
  * not available offline), small graph builders, and DuckDB recursive-CTE
  * SQL used by `repro.Oracle` to check whole-algorithm fixpoints.
  */
object TestUtil {

  /** Run a ScalaCheck property and fail the surrounding ScalaTest test if it
    * does not pass.
    */
  def checkProp(prop: Prop, minSuccessful: Int = 30): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }

  /** Lower shuffle parallelism for iterative engine tests — tiny inputs,
    * many rounds.
    */
  def tuneForIteration(spark: SparkSession): Unit =
    spark.conf.set("spark.sql.shuffle.partitions", "8")

  /** Build a PropertyGraph from literal (src, dst, weight) triples. */
  def graph(spark: SparkSession, edges: Seq[(Long, Long, Double)], name: String = "t"): PropertyGraph = {
    import spark.implicits._
    PropertyGraph(edges.toDF("src", "dst", "weight"), name)
  }

  /** Collect a graph's edges to the driver for the pure-Scala references. */
  def collectEdges(g: PropertyGraph): Seq[(Long, Long, Double)] = {
    val spark = g.spark
    import spark.implicits._
    g.edges.select($"src", $"dst", $"weight").as[(Long, Long, Double)].collect().toSeq
  }

  /** Paper Fig. 1 example graph (final SSSP dists 0,1,2,2,3,4 from V0). */
  def figure1(spark: SparkSession): PropertyGraph = graph(spark, Seq(
    (0L, 1L, 1.0), (0L, 3L, 2.0), (1L, 2L, 1.0),
    (3L, 4L, 2.0), (2L, 4L, 1.0), (4L, 5L, 1.0),
  ), "fig1")

  /** A vertex->value map as a two-column DataFrame. */
  def valuesDF(spark: SparkSession, m: Map[Long, Double], valueCol: String): DataFrame = {
    import spark.implicits._
    m.toSeq.sortBy(_._1).toDF("id", valueCol)
  }

  private val edgeCte =
    "e AS (SELECT CAST(src AS BIGINT) AS s, CAST(dst AS BIGINT) AS d, CAST(weight AS DOUBLE) AS w FROM edges)"

  /** DuckDB SSSP over table `edges`: min path sum per reachable vertex,
    * bounded below `bound` so recursion over cyclic graphs terminates
    * (weights are integral and >= 1 in all generated test graphs).
    */
  def ssspSql(root: Long, bound: Double): String =
    s"""WITH RECURSIVE $edgeCte,
       |walk(v, dist) AS (
       |  SELECT CAST($root AS BIGINT) AS v, CAST(0 AS DOUBLE) AS dist
       |  UNION
       |  SELECT e.d, walk.dist + e.w FROM walk JOIN e ON e.s = walk.v
       |  WHERE walk.dist + e.w < $bound
       |)
       |SELECT v AS id, MIN(dist) AS dist FROM walk GROUP BY v""".stripMargin

  /** DuckDB connected components over tables `edges` (pre-symmetrized) and
    * `verts`: min reachable id per vertex.
    */
  val ccSql: String =
    s"""WITH RECURSIVE $edgeCte,
       |vs AS (SELECT CAST(id AS BIGINT) AS id FROM verts),
       |lab(v, l) AS (
       |  SELECT id, id FROM vs
       |  UNION
       |  SELECT e.d, lab.l FROM lab JOIN e ON e.s = lab.v
       |)
       |SELECT v AS id, MIN(l) AS label FROM lab GROUP BY v""".stripMargin

  /** DuckDB widest path from `root` over table `edges`: max bottleneck per
    * reachable vertex; terminates because widths only come from the finite
    * weight set.
    */
  def wpSql(root: Long): String =
    s"""WITH RECURSIVE $edgeCte,
       |walk(v, wd) AS (
       |  SELECT CAST($root AS BIGINT) AS v, CAST(1e18 AS DOUBLE) AS wd
       |  UNION
       |  SELECT e.d, LEAST(walk.wd, e.w) FROM walk JOIN e ON e.s = walk.v
       |)
       |SELECT v AS id, MAX(wd) AS width FROM walk GROUP BY v""".stripMargin

  /** DuckDB PageRank by `iters` unrolled CTE iterations over `edges` and
    * `verts`, rounded to 4 decimals.
    */
  def prSql(iters: Int): String = {
    val sb = new StringBuilder
    sb.append(s"WITH $edgeCte,\n")
    sb.append("deg AS (SELECT s, COUNT(*) AS c FROM e GROUP BY s),\n")
    sb.append("vs AS (SELECT CAST(id AS BIGINT) AS id FROM verts),\n")
    sb.append("pr0 AS (SELECT id, CAST(1.0 AS DOUBLE) AS r FROM vs)")
    for (i <- 1 to iters) {
      sb.append(s""",
        |pr$i AS (
        |  SELECT vs.id, 0.15 + 0.85 * COALESCE(SUM(m.contrib), 0) AS r
        |  FROM vs LEFT JOIN (
        |    SELECT e.d, p.r / dg.c AS contrib
        |    FROM e JOIN pr${i - 1} p ON p.id = e.s JOIN deg dg ON dg.s = e.s
        |  ) m ON m.d = vs.id
        |  GROUP BY vs.id
        |)""".stripMargin)
    }
    sb.append(s"\nSELECT id, ROUND(r, 4) AS rank FROM pr$iters")
    sb.toString
  }

  /** Max |a(k) - b(k)| over the union of keys (missing keys fail loudly). */
  def maxAbsDiff(a: Map[Long, Double], b: Map[Long, Double]): Double = {
    assert(a.keySet == b.keySet, s"key sets differ: ${a.keySet.diff(b.keySet)} / ${b.keySet.diff(a.keySet)}")
    if (a.isEmpty) 0.0 else a.keysIterator.map(k => math.abs(a(k) - b(k))).max
  }
}
