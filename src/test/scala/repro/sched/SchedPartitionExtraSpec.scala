package repro.sched

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil.checkProp
import repro.partition.Chunking

/** Extra properties tying the balance substrates together. */
class SchedPartitionExtraSpec extends AnyFunSuite {

  test("property: stealing imbalance never exceeds static imbalance") {
    checkProp(Prop.forAll(Gen.nonEmptyListOf(Gen.choose(0L, 500L)), Gen.choose(2, 8)) {
      (costs: List[Long], t: Int) =>
        WorkStealing.stealingSchedule(costs, t).imbalance <=
          WorkStealing.staticSchedule(costs, t).imbalance + 1e-9
    }, minSuccessful = 40)
  }

  test("stealing a monotone-decreasing cost profile (RR ramp shape)") {
    // RR skews early chunks heavy (low lastIter vertices compute most).
    val costs = (0 until 32).map(i => (1000 - 30 * i).toLong.max(1L))
    val static = WorkStealing.staticSchedule(costs, 4)
    val steal = WorkStealing.stealingSchedule(costs, 4)
    assert(steal.makespan <= static.makespan)
    assert(steal.imbalance <= static.imbalance)
  }

  test("chunking emits exactly `parts` chunks") {
    checkProp(Prop.forAll(Gen.choose(1, 100), Gen.choose(1, 10)) { (n: Int, p: Int) =>
      Chunking.partition((0L until n.toLong).toSeq, _ => 1L, p).size == p
    }, minSuccessful = 40)
  }

  test("chunking vertices stay sorted within and across chunks") {
    val chunks = Chunking.partition(Seq(5L, 1L, 9L, 3L, 7L), _ => 2L, 2)
    val flat = chunks.flatMap(_.vertices)
    assert(flat == flat.sorted)
  }

  test("chunk edge field equals the sum of member degrees") {
    val deg: Long => Long = v => v + 1
    val chunks = Chunking.partition((0L until 20L).toSeq, deg, 3)
    chunks.foreach(c => assert(c.edges == c.vertices.map(deg).sum))
  }

  test("work stealing handles an all-zero cost vector") {
    val s = WorkStealing.stealingSchedule(Seq(0L, 0L, 0L), 2)
    assert(s.makespan == 0L && s.finishTimes.sum == 0L)
  }

  test("chunkCosts of empty input is empty") {
    assert(WorkStealing.chunkCosts(Nil) == Vector.empty)
  }
}
