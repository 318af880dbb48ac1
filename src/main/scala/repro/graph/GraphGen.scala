package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Deterministic synthetic graph generators.
  *
  * The paper evaluates on seven real-world power-law graphs (SNAP/KONECT)
  * plus an RMAT graph. Offline, we substitute deterministic RMAT stand-ins
  * whose (|V|, |E|) are the paper's scaled down (divisors documented in
  * `datasets` and DESIGN.md). RMAT with the classic (a,b,c,d) =
  * (0.57, 0.19, 0.19, 0.05) reproduces the heavy-tailed degree skew that
  * drives the redundancy behaviour the paper measures.
  */
object GraphGen {

  /** SplitMix64 — cheap, high-quality 64-bit mixer for per-edge determinism. */
  private[graph] def mix64(x0: Long): Long = {
    var x = x0 + 0x9E3779B97F4A7C15L
    x = (x ^ (x >>> 30)) * 0xBF58476D1CE4E5B9L
    x = (x ^ (x >>> 27)) * 0x94D049BB133111EBL
    x ^ (x >>> 31)
  }

  /** Uniform double in [0,1) from a 64-bit state. */
  private def unit(x: Long): Double = (x >>> 11).toDouble / (1L << 53).toDouble

  /** One RMAT edge for (seed, index) over 2^scale vertices. */
  private[graph] def rmatEdge(scale: Int, seed: Long, index: Long,
                              a: Double, b: Double, c: Double): (Long, Long) = {
    var src = 0L; var dst = 0L
    var state = mix64(seed ^ mix64(index))
    var lvl = 0
    while (lvl < scale) {
      state = mix64(state)
      val r = unit(state)
      val (sb, db) =
        if (r < a) (0L, 0L)
        else if (r < a + b) (0L, 1L)
        else if (r < a + b + c) (1L, 0L)
        else (1L, 1L)
      src = (src << 1) | sb
      dst = (dst << 1) | db
      lvl += 1
    }
    (src, dst)
  }

  /** Deterministic integral edge weight in [1, maxW]. */
  private[graph] def edgeWeight(src: Long, dst: Long, maxW: Int): Double =
    1.0 + java.lang.Math.floorMod(mix64(src * 0x9E3779B97F4A7C15L ^ dst), maxW).toDouble

  /** RMAT edge list: `src, dst, weight` over 2^scale vertex ids.
    *
    * Oversamples, drops self-loops and duplicates, then takes a
    * deterministic (hash-ordered) prefix of `nEdges` — so small-scale RMAT
    * (whose hubs generate many duplicate edges) still lands near the target
    * edge count. Fully deterministic in (scale, nEdges, seed).
    */
  def rmat(spark: SparkSession, scale: Int, nEdges: Long, seed: Long,
           a: Double = 0.57, b: Double = 0.19, c: Double = 0.19,
           maxWeight: Int = 10): DataFrame = {
    import spark.implicits._
    val oversample = math.max(nEdges * 2, 64L)
    val edgeUdf = udf { (i: Long) =>
      val (s, d) = rmatEdge(scale, seed, i, a, b, c)
      (s, d)
    }
    spark.range(oversample)
      .select(edgeUdf($"id") as "e")
      .select($"e._1" as "src", $"e._2" as "dst")
      .filter($"src" =!= $"dst")
      .distinct()
      .orderBy(abs(hash($"src", $"dst")), $"src", $"dst")
      .limit(if (nEdges > Int.MaxValue) Int.MaxValue else nEdges.toInt)
      .select($"src", $"dst",
        udf((s: Long, d: Long) => edgeWeight(s, d, maxWeight)).apply($"src", $"dst") as "weight")
  }

  /** Uniform random simple digraph — small test graphs with no skew. */
  def uniform(spark: SparkSession, nVertices: Long, nEdges: Long, seed: Long,
              maxWeight: Int = 10): DataFrame = {
    import spark.implicits._
    val pair = udf { (i: Long) =>
      val s = java.lang.Math.floorMod(mix64(seed ^ mix64(2 * i)), nVertices)
      val d = java.lang.Math.floorMod(mix64(seed ^ mix64(2 * i + 1)), nVertices)
      (s, d)
    }
    spark.range(math.max(nEdges * 2, 16L))
      .select(pair($"id") as "e")
      .select($"e._1" as "src", $"e._2" as "dst")
      .filter($"src" =!= $"dst")
      .distinct()
      .orderBy(abs(hash($"src", $"dst")), $"src", $"dst")
      .limit(nEdges.toInt)
      .select($"src", $"dst",
        udf((s: Long, d: Long) => edgeWeight(s, d, maxWeight)).apply($"src", $"dst") as "weight")
  }

  /** One evaluation dataset: a scaled stand-in for a paper graph (Table 4). */
  final case class GraphSpec(name: String, scale: Int, targetEdges: Long, seed: Long,
                             paperV: Double, paperE: Double, divisor: Int, kind: String) {
    /** Paper |V| and |E| in raw counts (paper table lists M/B units). */
    def paperVertices: Long = (paperV * 1e6).toLong
    def paperEdges: Long = (paperE * 1e6).toLong
  }

  /** The seven real-graph stand-ins (paper Table 4). Edge counts are the
    * paper's scaled down (PK/OK/LJ/ST by 1/1000, WK/DI by 1/4000, FS by
    * 1/8000, so the biggest graph stays the biggest while the full
    * 5-app x 7-graph sweep fits a laptop-scale Spark session). The vertex
    * id space (`scale`) is chosen for BFS depth rather than for the paper's
    * average degree: shrinking a graph at constant degree collapses its
    * diameter, and diameter is what drives the ramp-up redundancy the paper
    * measures — see DESIGN.md for this substitution.
    */
  val datasets: Seq[GraphSpec] = Seq(
    GraphSpec("PK", 13,  30600L, 101, 1.6,   30.6, 1000, "Social"),
    GraphSpec("OK", 14, 117200L, 102, 3.1,  117.2, 1000, "Social"),
    GraphSpec("LJ", 14,  69000L, 103, 4.8,   69.0, 1000, "Social"),
    GraphSpec("WK", 14,  94525L, 104, 12.1, 378.1, 4000, "Hyperlink"),
    GraphSpec("DI", 14,  75300L, 105, 33.8, 301.2, 4000, "Folksonomy"),
    GraphSpec("ST", 14,  85300L, 106, 11.3,  85.3, 1000, "Social"),
    GraphSpec("FS", 15, 225000L, 107, 65.6, 1800.0, 8000, "Social"),
  )

  /** Materialise one dataset as a cached PropertyGraph. */
  def build(spark: SparkSession, spec: GraphSpec, partitions: Int = 8): PropertyGraph =
    PropertyGraph(
      rmat(spark, spec.scale, spec.targetEdges, spec.seed).repartition(partitions),
      spec.name
    ).cached()
}
