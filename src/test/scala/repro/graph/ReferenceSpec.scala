package repro.graph

import org.scalacheck.{Gen, Prop}
import repro.TestUtil._

/** The pure-Scala references are themselves oracles for the engines, so they
  * get their own sanity tests against hand-computed answers and mutual
  * consistency properties.
  */
class ReferenceSpec extends org.scalatest.funsuite.AnyFunSuite {

  private val fig1 = Seq(
    (0L, 1L, 1.0), (0L, 3L, 2.0), (1L, 2L, 1.0),
    (3L, 4L, 2.0), (2L, 4L, 1.0), (4L, 5L, 1.0))

  private def randomEdges(seed: Long, n: Int, e: Int): Seq[(Long, Long, Double)] = {
    val rnd = new scala.util.Random(seed)
    (1 to e).map { _ =>
      (rnd.nextInt(n).toLong, rnd.nextInt(n).toLong, (1 + rnd.nextInt(9)).toDouble)
    }.filter(t => t._1 != t._2).distinct
  }

  test("dijkstra on the paper's Fig. 1 graph matches the iteration table") {
    val d = Reference.sssp(fig1, 0L)
    assert(d == Map(0L -> 0.0, 1L -> 1.0, 2L -> 2.0, 3L -> 2.0, 4L -> 3.0, 5L -> 4.0))
  }

  test("dijkstra marks unreachable vertices Inf") {
    val d = Reference.sssp(Seq((0L, 1L, 1.0), (2L, 3L, 1.0)), 0L)
    assert(d(3L) == Reference.Inf && d(1L) == 1.0)
  }

  test("dijkstra distances obey the triangle inequality over every edge") {
    checkProp(Prop.forAll(Gen.choose(0L, 200L)) { seed: Long =>
      val es = randomEdges(seed, 20, 60)
      if (es.isEmpty) true
      else {
        val d = Reference.sssp(es, es.head._1)
        es.forall { case (s, t, w) => d(t) <= d(s) + w + 1e-9 }
      }
    }, minSuccessful = 25)
  }

  test("widestPath on Fig. 1") {
    val w = Reference.widestPath(fig1, 0L)
    // 0->3 (2) -> 4 (2) beats 0->1->2->4 (1); 5 via 4 bottlenecked at 1.
    assert(w(0L) == Reference.Inf && w(3L) == 2.0 && w(4L) == 2.0 && w(5L) == 1.0)
  }

  test("widestPath is monotone: width(dst) >= min(width(src), w)") {
    checkProp(Prop.forAll(Gen.choose(0L, 200L)) { seed: Long =>
      val es = randomEdges(seed, 15, 40)
      if (es.isEmpty) true
      else {
        val w = Reference.widestPath(es, es.head._1)
        es.forall { case (s, t, ew) => w(t) >= math.min(w(s), ew) - 1e-9 }
      }
    }, minSuccessful = 25)
  }

  test("components of two disjoint chains") {
    val es = Seq((0L, 1L, 1.0), (1L, 2L, 1.0), (5L, 6L, 1.0))
    val c = Reference.components(es)
    assert(c == Map(0L -> 0L, 1L -> 0L, 2L -> 0L, 5L -> 5L, 6L -> 5L))
  }

  test("components treat direction as irrelevant") {
    val c = Reference.components(Seq((2L, 1L, 1.0), (3L, 2L, 1.0)))
    assert(c.values.toSet == Set(1L))
  }

  test("components labels are component minima and idempotent under relabel") {
    checkProp(Prop.forAll(Gen.choose(0L, 300L)) { seed: Long =>
      val es = randomEdges(seed, 25, 40)
      if (es.isEmpty) true
      else {
        val c = Reference.components(es)
        // every edge joins equal labels, and each label is its own label
        es.forall { case (s, t, _) => c(s) == c(t) } && c.values.forall(l => c(l) == l)
      }
    }, minSuccessful = 25)
  }

  test("pagerank of a 2-cycle is the analytic fixpoint 1.0") {
    // r = 0.15 + 0.85 * r  has fixpoint 1.0 for both vertices of a 2-cycle.
    val r = Reference.pagerank(Seq((0L, 1L, 1.0), (1L, 0L, 1.0)), 60)
    assert(math.abs(r(0L) - 1.0) < 1e-9 && math.abs(r(1L) - 1.0) < 1e-9)
  }

  test("pagerank of a star: center collects, leaves hold 0.15 + 0.85*center/k") {
    // leaves -> center; center has no out-edges (rank leaks, as documented).
    val es = Seq((1L, 0L, 1.0), (2L, 0L, 1.0), (3L, 0L, 1.0))
    val r = Reference.pagerank(es, 50)
    assert(math.abs(r(1L) - 0.15) < 1e-9)
    assert(math.abs(r(0L) - (0.15 + 0.85 * 3 * 0.15)) < 1e-9)
  }

  test("pagerank values are bounded below by 0.15") {
    checkProp(Prop.forAll(Gen.choose(0L, 100L)) { seed: Long =>
      val es = randomEdges(seed, 15, 40)
      es.isEmpty || Reference.pagerank(es, 10).values.forall(_ >= 0.15 - 1e-12)
    }, minSuccessful = 20)
  }

  test("tunkrank of a single follower edge") {
    // 0 follows 1: t(1) = (1 + 0.5*t(0)) / outDeg(0) = 1, t(0) = 0.
    val t = Reference.tunkrank(Seq((0L, 1L, 1.0)), 10)
    assert(t(0L) == 0.0 && math.abs(t(1L) - 1.0) < 1e-12)
  }

  test("bfsGuidance on Fig. 1: levels and lastIter") {
    val (level, last) = Reference.bfsGuidance(fig1, Set(0L))
    assert(level == Map(0L -> 0, 1L -> 1, 3L -> 1, 2L -> 2, 4L -> 2, 5L -> 3))
    // lastIter(4) = 1 + max(level(3), level(2)) = 3; lastIter(5) = 1 + level(4) = 3.
    assert(last(4L) == 3 && last(5L) == 3 && last(1L) == 1 && last(2L) == 2)
  }

  test("bfsGuidance: lastIter >= level for every reached non-root") {
    checkProp(Prop.forAll(Gen.choose(0L, 300L)) { seed: Long =>
      val es = randomEdges(seed, 20, 50)
      if (es.isEmpty) true
      else {
        val (level, last) = Reference.bfsGuidance(es, Set(es.head._1))
        last.forall { case (v, li) => li >= level(v) }
      }
    }, minSuccessful = 25)
  }
}
