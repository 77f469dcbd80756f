package repro.core.multi

import repro.core.SlotCandidates

/** Global (worker, slot) occupancy — a worker serves at most one subtask per
  * time slot, which is what creates cross-task conflicts (Section IV-A).
  *
  * Thread-safe: `tryTake` is atomic so parallel frameworks can share one
  * pool; losers of a race simply recompute their next-cheapest candidate.
  */
final class WorkerPool {
  private val taken = java.util.concurrent.ConcurrentHashMap.newKeySet[Long]()

  private def key(worker: Int, slot: Int): Long = (slot.toLong << 32) | (worker.toLong & 0xffffffffL)

  def isTaken(worker: Int, slot: Int): Boolean = taken.contains(key(worker, slot))

  /** Atomically claim (worker, slot); false if already taken. */
  def tryTake(worker: Int, slot: Int): Boolean = taken.add(key(worker, slot))

  def takenCount: Int = taken.size

  /** Rank of the cheapest still-free candidate for this slot, or -1 when the
    * whole known candidate list is occupied.
    */
  def freeRank(sc: SlotCandidates, slot: Int): Int = {
    var r = 0
    while (r < sc.workers.length) {
      if (!isTaken(sc.workers(r), slot)) return r
      r += 1
    }
    -1
  }

  /** Rank of `worker` within the candidate list, or -1. */
  def rankOf(sc: SlotCandidates, worker: Int): Int = {
    var r = 0
    while (r < sc.workers.length) {
      if (sc.workers(r) == worker) return r
      r += 1
    }
    -1
  }
}
