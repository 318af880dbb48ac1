package repro.sched

import scala.collection.mutable

/** Deterministic simulator of SLFE's intra-node work stealing (paper §3.6).
  *
  * The engine splits each partition into 256-vertex mini-chunks; threads
  * drain their own contiguous chunk list and, when done, steal the tail
  * chunk of the thread with the most remaining work. We simulate that
  * discipline over per-chunk cost arrays (e.g. per-chunk edge-computation
  * counts from a real run, which RR skews) and report makespans — the data
  * behind the paper's Fig. 10a discussion.
  */
object WorkStealing {

  /** Vertices per mini-chunk, as in the paper. */
  val ChunkSize = 256

  /** Fold per-vertex costs into mini-chunk costs. */
  def chunkCosts(perVertexCost: Seq[Long], chunkSize: Int = ChunkSize): Vector[Long] =
    perVertexCost.grouped(chunkSize).map(_.sum).toVector

  final case class Schedule(
      finishTimes: Vector[Long],
      chunkOwner: Vector[Int],
      steals: Int,
  ) {
    def makespan: Long = if (finishTimes.isEmpty) 0L else finishTimes.max
    /** Max thread time over mean thread time — 1.0 is perfect balance. */
    def imbalance: Double = {
      val busy = finishTimes.map(_.toDouble)
      if (busy.isEmpty || busy.sum == 0) 1.0 else busy.max / (busy.sum / busy.length)
    }
  }

  /** Static contiguous assignment, no stealing: thread t gets chunk range
    * [t*n/T, (t+1)*n/T). The baseline the paper measures against.
    */
  def staticSchedule(costs: Seq[Long], threads: Int): Schedule = {
    require(threads > 0)
    val n = costs.size
    val owner = Vector.tabulate(n)(i => math.min(threads - 1, i * threads / math.max(n, 1)))
    val finish = Vector.tabulate(threads)(t =>
      costs.iterator.zipWithIndex.filter { case (_, i) => owner(i) == t }.map(_._1).sum)
    Schedule(finish, owner, steals = 0)
  }

  /** Event-driven stealing simulation. Each thread owns the same contiguous
    * range as [[staticSchedule]]; an idle thread steals the last pending
    * chunk of the thread with the most remaining work. Deterministic:
    * ties break by thread index.
    */
  def stealingSchedule(costs: Seq[Long], threads: Int): Schedule = {
    require(threads > 0)
    val n = costs.size
    val pending = Array.fill(threads)(mutable.ArrayDeque.empty[Int])
    costs.indices.foreach { i =>
      pending(math.min(threads - 1, i * threads / math.max(n, 1))).append(i)
    }
    val time = Array.fill(threads)(0L)
    val owner = Array.fill(n)(-1)
    var steals = 0
    var remaining = n
    while (remaining > 0) {
      // The earliest-free thread acts next (ties by index).
      val t = time.indices.minBy(i => (time(i), i))
      val chunk =
        if (pending(t).nonEmpty) Some(pending(t).removeHead())
        else {
          val victims = pending.indices.filter(v => pending(v).nonEmpty)
          if (victims.isEmpty) None
          else {
            val v = victims.maxBy(v0 => (pending(v0).map(costs(_)).sum, -v0))
            steals += 1
            Some(pending(v).removeLast())
          }
        }
      chunk match {
        case Some(c) =>
          owner(c) = t
          time(t) += costs(c)
          remaining -= 1
        case None => remaining = 0 // defensive; cannot happen while remaining > 0
      }
    }
    Schedule(time.toVector, owner.toVector, steals)
  }
}
