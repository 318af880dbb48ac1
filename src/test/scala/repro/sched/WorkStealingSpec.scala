package repro.sched

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.checkProp

class WorkStealingSpec extends AnyFunSuite {

  private val costsGen: Gen[List[Long]] =
    Gen.nonEmptyListOf(Gen.choose(0L, 1000L))

  test("chunkCosts folds per-vertex costs into 256-vertex chunks") {
    val per = Seq.fill(600)(1L)
    val chunks = WorkStealing.chunkCosts(per)
    assert(chunks == Vector(256L, 256L, 88L))
  }

  test("chunkCosts with custom chunk size") {
    assert(WorkStealing.chunkCosts(Seq(1L, 2L, 3L, 4L, 5L), 2) == Vector(3L, 7L, 5L))
  }

  test("static schedule covers every chunk exactly once") {
    val s = WorkStealing.staticSchedule(Seq(5L, 1L, 9L, 2L, 2L), threads = 2)
    assert(s.chunkOwner.size == 5 && s.chunkOwner.forall(t => t >= 0 && t < 2))
  }

  test("static schedule total time equals total cost") {
    val costs = Seq(5L, 1L, 9L, 2L, 2L, 7L)
    val s = WorkStealing.staticSchedule(costs, threads = 3)
    assert(s.finishTimes.sum == costs.sum)
  }

  test("stealing schedule processes every chunk exactly once") {
    val costs = Seq(5L, 1L, 9L, 2L, 2L, 7L, 3L)
    val s = WorkStealing.stealingSchedule(costs, threads = 3)
    assert(s.chunkOwner.forall(_ >= 0))
    assert(s.finishTimes.sum == costs.sum)
  }

  test("stealing fixes a pathologically skewed static assignment") {
    // All the work in the first half -> one thread would do everything.
    val costs = Seq.fill(8)(100L) ++ Seq.fill(8)(0L)
    val static = WorkStealing.staticSchedule(costs, threads = 2)
    val steal = WorkStealing.stealingSchedule(costs, threads = 2)
    assert(static.makespan == 800L)
    assert(steal.makespan == 400L)
    assert(steal.steals > 0)
  }

  test("single thread: stealing degenerates to the serial sum") {
    val costs = Seq(3L, 4L, 5L)
    val s = WorkStealing.stealingSchedule(costs, threads = 1)
    assert(s.makespan == 12L && s.steals == 0)
  }

  test("deterministic: same input gives the same schedule") {
    val costs = Seq(9L, 1L, 7L, 3L, 8L, 2L, 6L, 4L)
    val a = WorkStealing.stealingSchedule(costs, 3)
    val b = WorkStealing.stealingSchedule(costs, 3)
    assert(a == b)
  }

  test("property: stealing never worsens the static makespan") {
    checkProp(Prop.forAll(costsGen, Gen.choose(1, 8)) { (costs: List[Long], t: Int) =>
      WorkStealing.stealingSchedule(costs, t).makespan <=
        WorkStealing.staticSchedule(costs, t).makespan
    }, minSuccessful = 50)
  }

  test("property: makespan is bounded below by max(maxChunk, ceil(total/threads))") {
    checkProp(Prop.forAll(costsGen, Gen.choose(1, 8)) { (costs: List[Long], t: Int) =>
      val s = WorkStealing.stealingSchedule(costs, t)
      val lower = math.max(costs.max, (costs.sum + t - 1) / t)
      s.makespan >= math.min(lower, costs.sum) - 1 || s.makespan >= lower
    }, minSuccessful = 50)
  }

  test("property: every chunk is owned and totals balance") {
    checkProp(Prop.forAll(costsGen, Gen.choose(1, 6)) { (costs: List[Long], t: Int) =>
      val s = WorkStealing.stealingSchedule(costs, t)
      s.chunkOwner.size == costs.size &&
        s.chunkOwner.forall(o => o >= 0 && o < t) &&
        s.finishTimes.sum == costs.sum
    }, minSuccessful = 50)
  }

  test("imbalance of a perfectly balanced schedule is 1.0") {
    val s = WorkStealing.staticSchedule(Seq(5L, 5L, 5L, 5L), threads = 2)
    assert(math.abs(s.imbalance - 1.0) < 1e-12)
  }

  test("imbalance grows with skew") {
    val s = WorkStealing.staticSchedule(Seq(10L, 10L, 0L, 0L), threads = 2)
    assert(s.imbalance == 2.0)
  }
}
