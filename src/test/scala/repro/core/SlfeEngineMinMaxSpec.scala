package repro.core

import repro.{Oracle, SparkSpec, TestUtil}
import repro.apps.Apps
import repro.graph.{GraphGen, PropertyGraph, Reference}

/** The "start late" half of the paper: min/max applications on the SLFE
  * engine, with and without redundancy reduction, against Dijkstra-family
  * references and DuckDB recursive-CTE oracles.
  */
class SlfeEngineMinMaxSpec extends SparkSpec {
  import TestUtil._

  override def beforeAll(): Unit = { super.beforeAll(); tuneForIteration(spark) }

  private def ssspBoth(g: PropertyGraph, root: Long): (RunResult, RunResult) = {
    val rrg = RRGuidance.generate(g, Set(root))
    val noRR = SlfeEngine.edgeProcMinMax(g, Apps.sssp(root), None, "Gemini")
    val withRR = SlfeEngine.edgeProcMinMax(g, Apps.sssp(root), Some(rrg), "SLFE")
    (noRR, withRR)
  }

  test("SSSP without RR reproduces the paper's Fig. 1 final distances") {
    val g = figure1(spark)
    val r = SlfeEngine.edgeProcMinMax(g, Apps.sssp(0L), None, "Gemini")
    assert(r.values == Map(0L -> 0.0, 1L -> 1.0, 2L -> 2.0, 3L -> 2.0, 4L -> 3.0, 5L -> 4.0))
  }

  test("SSSP with RR reproduces the same Fig. 1 distances (Theorem 1)") {
    val g = figure1(spark)
    val (_, withRR) = ssspBoth(g, 0L)
    assert(withRR.values == Map(0L -> 0.0, 1L -> 1.0, 2L -> 2.0, 3L -> 2.0, 4L -> 3.0, 5L -> 4.0))
  }

  test("SSSP matches Dijkstra on random RMAT graphs, with and without RR") {
    for (seed <- Seq(21L, 22L, 23L)) {
      val g = PropertyGraph(GraphGen.rmat(spark, 6, 150, seed)).cached()
      val root = g.maxOutDegVertex
      val expected = Reference.sssp(collectEdges(g), root)
      val (noRR, withRR) = ssspBoth(g, root)
      assert(maxAbsDiff(noRR.values, expected) < 1e-9, s"seed=$seed noRR")
      assert(maxAbsDiff(withRR.values, expected) < 1e-9, s"seed=$seed withRR")
      g.unpersist()
    }
  }

  test("SSSP final distances match the DuckDB recursive oracle") {
    val g = PropertyGraph(GraphGen.uniform(spark, 25, 70, 31)).cached()
    val root = g.maxOutDegVertex
    val r = SlfeEngine.edgeProcMinMax(g, Apps.sssp(root), None, "Gemini")
    val reachable = r.values.filter(_._2 < 1e17)
    Oracle.assertEquivalent(
      valuesDF(spark, reachable, "dist"),
      ssspSql(root, bound = 25.0 * 10 + 1),
      "edges" -> g.edges)
    g.unpersist()
  }

  test("SSSP with RR matches the DuckDB recursive oracle too") {
    val g = PropertyGraph(GraphGen.uniform(spark, 25, 70, 32)).cached()
    val root = g.maxOutDegVertex
    val rrg = RRGuidance.generate(g, Set(root))
    val r = SlfeEngine.edgeProcMinMax(g, Apps.sssp(root), Some(rrg), "SLFE")
    Oracle.assertEquivalent(
      valuesDF(spark, r.values.filter(_._2 < 1e17), "dist"),
      ssspSql(root, bound = 25.0 * 10 + 1),
      "edges" -> g.edges)
    g.unpersist()
  }

  test("CC labels every vertex with its component minimum (vs union-find)") {
    for (seed <- Seq(41L, 42L)) {
      val base = PropertyGraph(GraphGen.uniform(spark, 30, 45, seed))
      val g = base.symmetrize.cached()
      val expected = Reference.components(collectEdges(base)).map { case (k, v) => k -> v.toDouble }
      val rrg = RRGuidance.generate(g, Set(g.vertexIds.min))
      val noRR = SlfeEngine.edgeProcMinMax(g, Apps.cc, None, "Gemini")
      val withRR = SlfeEngine.edgeProcMinMax(g, Apps.cc, Some(rrg), "SLFE")
      assert(maxAbsDiff(noRR.values, expected) == 0.0, s"seed=$seed noRR")
      assert(maxAbsDiff(withRR.values, expected) == 0.0, s"seed=$seed withRR")
      g.unpersist()
    }
  }

  test("CC matches the DuckDB min-label closure oracle") {
    val g = TestUtil.graph(spark,
      Seq((0L, 1L, 1.0), (1L, 2L, 1.0), (5L, 6L, 1.0), (7L, 5L, 1.0), (9L, 9L + 1, 1.0)))
      .symmetrize
    val r = SlfeEngine.edgeProcMinMax(g, Apps.cc, None, "Gemini")
    import org.apache.spark.sql.functions.col
    val labels = valuesDF(spark, r.values, "v").select(col("id"), col("v").cast("long") as "label")
    Oracle.assertEquivalent(labels, ccSql, "edges" -> g.edges, "verts" -> g.vertices)
  }

  test("WP matches the reference widest path, with and without RR") {
    for (seed <- Seq(51L, 52L)) {
      val g = PropertyGraph(GraphGen.rmat(spark, 6, 180, seed)).cached()
      val root = g.maxOutDegVertex
      val expected = Reference.widestPath(collectEdges(g), root)
      val rrg = RRGuidance.generate(g, Set(root))
      val noRR = SlfeEngine.edgeProcMinMax(g, Apps.wp(root), None, "Gemini")
      val withRR = SlfeEngine.edgeProcMinMax(g, Apps.wp(root), Some(rrg), "SLFE")
      assert(maxAbsDiff(noRR.values, expected) < 1e-9, s"seed=$seed noRR")
      assert(maxAbsDiff(withRR.values, expected) < 1e-9, s"seed=$seed withRR")
      g.unpersist()
    }
  }

  test("WP matches the DuckDB max-min closure oracle") {
    val g = PropertyGraph(GraphGen.uniform(spark, 20, 50, 61)).cached()
    val root = g.maxOutDegVertex
    val r = SlfeEngine.edgeProcMinMax(g, Apps.wp(root), None, "Gemini")
    Oracle.assertEquivalent(
      valuesDF(spark, r.values.filter(_._2 > 0.0), "width"),
      wpSql(root),
      "edges" -> g.edges)
    g.unpersist()
  }

  test("RR and no-RR converge to identical values on many seeds (Theorem 1)") {
    for (seed <- 71L to 75L) {
      val g = PropertyGraph(GraphGen.uniform(spark, 20, 55, seed)).cached()
      val root = g.maxOutDegVertex
      val (noRR, withRR) = ssspBoth(g, root)
      assert(noRR.values == withRR.values, s"seed=$seed")
      g.unpersist()
    }
  }

  test("SSSP starts in push mode from a single active root") {
    val g = figure1(spark)
    val r = SlfeEngine.edgeProcMinMax(g, Apps.sssp(0L), None, "Gemini", denseFrac = 0.5)
    assert(r.stats.head.mode == "push")
  }

  test("CC starts in pull mode with all vertices active") {
    val g = figure1(spark).symmetrize
    val r = SlfeEngine.edgeProcMinMax(g, Apps.cc, None, "Gemini")
    assert(r.stats.head.mode == "pull")
  }

  test("RR run ends with a clean all-active push verification pass") {
    val g = figure1(spark)
    val rrg = RRGuidance.generate(g, Set(0L))
    val r = SlfeEngine.edgeProcMinMax(g, Apps.sssp(0L), Some(rrg), "SLFE")
    val lastStat = r.stats.last
    assert(lastStat.mode == "push" && lastStat.updates == 0)
  }

  test("delayed vertices are still computed: RR result covers all reachable vertices") {
    // A long chain hanging off the hub: its tail has a large lastIter and a
    // fast-converging remainder could otherwise strand it (the case the
    // verification push exists for).
    val chain = (0 until 8).map(i => (100L + i, 101L + i, 1.0))
    val g = TestUtil.graph(spark, Seq((0L, 100L, 1.0), (0L, 1L, 1.0)) ++ chain)
    val rrg = RRGuidance.generate(g, Set(0L))
    val r = SlfeEngine.edgeProcMinMax(g, Apps.sssp(0L), Some(rrg), "SLFE")
    assert(r.values(108L) == 9.0)
  }

  test("per-iteration computed vertices under RR never exceed the no-RR count") {
    val g = PropertyGraph(GraphGen.rmat(spark, 7, 300, 81)).cached()
    val root = g.maxOutDegVertex
    val (noRR, withRR) = ssspBoth(g, root)
    // Pull iterations without RR always compute every vertex; with RR the
    // ruler can only shrink that set.
    val noRRPullMax = noRR.stats.filter(_.mode == "pull").map(_.computedVertices)
    val rrPull = withRR.stats.filter(_.mode == "pull").map(_.computedVertices)
    if (noRRPullMax.nonEmpty && rrPull.nonEmpty)
      assert(rrPull.max <= noRRPullMax.max)
    g.unpersist()
  }

  test("updates-per-vertex is at least ~1 for reachable-heavy graphs (Table 2 metric)") {
    val g = PropertyGraph(GraphGen.rmat(spark, 7, 300, 82)).cached()
    val (noRR, _) = ssspBoth(g, g.maxOutDegVertex)
    assert(noRR.updatesPerVertex(g.numVertices) > 0.0)
    assert(noRR.totalUpdates >= noRR.values.count(_._2 < 1e17) - 1) // every reached vertex updated >= once
    g.unpersist()
  }

  test("engine fails loudly when maxIters is too small") {
    val g = figure1(spark)
    intercept[IllegalArgumentException] {
      SlfeEngine.edgeProcMinMax(g, Apps.sssp(0L), None, "Gemini", maxIters = 1)
    }
  }
}
