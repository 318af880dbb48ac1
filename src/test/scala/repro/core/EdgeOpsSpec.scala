package repro.core

import repro.{SparkSpec, TestUtil}
import repro.apps.Apps

/** The distributed aggregation primitive every engine is built on. */
class EdgeOpsSpec extends SparkSpec {
  import TestUtil._

  private def g = figure1(spark)

  private def srcsAll(values: Map[Long, Double]) =
    g.vertexIds.toSeq.map(v => (v, values.getOrElse(v, 0.0), g.outDeg(v)))

  test("min aggregation over all destinations") {
    // dist values: everyone 0 except V2=2, V3=2 -> V4 gets min(2+1, 2+2)=3.
    val values = Map(2L -> 2.0, 3L -> 2.0)
    val agg = EdgeOps.aggregate(g, Apps.sssp(0L), srcsAll(values), None)
    assert(agg(4L)._1 == 3.0 && agg(4L)._2 == 2) // two in-edges processed
    assert(agg(5L)._1 == 1.0) // V4 value 0 + weight 1
  }

  test("destination filter restricts computed vertices") {
    val agg = EdgeOps.aggregate(g, Apps.sssp(0L), srcsAll(Map.empty), Some(Seq(4L)))
    assert(agg.keySet == Set(4L))
  }

  test("empty source set yields no messages") {
    assert(EdgeOps.aggregate(g, Apps.sssp(0L), Nil, None).isEmpty)
  }

  test("empty destination set yields no messages") {
    assert(EdgeOps.aggregate(g, Apps.sssp(0L), srcsAll(Map.empty), Some(Nil)).isEmpty)
  }

  test("sum aggregation divides by source out-degree (PR message)") {
    // V0 has outDeg 2 -> contribution 0.5 to each of V1 and V3 when rank 1.
    val srcs = Seq((0L, 1.0, g.outDeg(0L)))
    val agg = EdgeOps.aggregate(g, Apps.pagerank(), srcs, None)
    assert(agg(1L)._1 == 0.5 && agg(3L)._1 == 0.5)
  }

  test("max aggregation with min(srcVal, weight) (WP message)") {
    // V4 hears from V3 (width 5 capped by weight 2) and V2 (width 0.5 capped by 1).
    val srcs = Seq((3L, 5.0, g.outDeg(3L)), (2L, 0.5, g.outDeg(2L)))
    val agg = EdgeOps.aggregate(g, Apps.wp(0L), srcs, None)
    assert(agg(4L)._1 == 2.0)
  }

  test("edge counts sum to edges out of the source set") {
    val srcs = Seq((0L, 0.0, 2L), (4L, 0.0, 1L)) // outDeg 2 + 1
    val agg = EdgeOps.aggregate(g, Apps.sssp(0L), srcs, None)
    assert(agg.valuesIterator.map(_._2).sum == 3)
  }

  test("initState attaches RRG lastIter and out-degrees") {
    val rrg = RRGuidance.generate(g, Set(0L))
    val st = EdgeOps.initState(g, Apps.sssp(0L), Some(rrg))
    val byId = st.map(v => v.id -> v).toMap
    assert(byId(0L).value == 0.0 && byId(0L).active)
    assert(byId(5L).value == Apps.Inf && !byId(5L).active)
    assert(byId(4L).lastIter == 3 && byId(0L).outDeg == 2)
  }

  test("initState without RRG leaves lastIter at 0") {
    val st = EdgeOps.initState(g, Apps.cc, None)
    assert(st.forall(_.lastIter == 0) && st.forall(_.active))
  }
}
