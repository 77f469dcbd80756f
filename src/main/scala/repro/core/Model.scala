package repro.core

/** Data model for time-continuous spatial crowdsourcing (TCSC).
  *
  * A task has a fixed 2-D location and a duration of `m` equal time slots
  * (subtasks). Executing subtask `(j)` means sending a worker who is
  * available at slot `j` to the task's location; the cost is the Euclidean
  * travel distance (paper, Section II-A).
  */

/** A TCSC task: identifier, location in the unit square, `m` subtasks. */
final case class Task(id: Int, x: Double, y: Double, m: Int)

/** Ranked worker candidates for one (task, slot) pair, ascending by cost.
  *
  * `workers(i)` is the id of the (i+1)-th nearest available worker at this
  * slot and `costs(i)` its travel distance. Empty arrays mean no worker is
  * available at this slot (the subtask can never be executed).
  */
final case class SlotCandidates(workers: Array[Int], costs: Array[Double]) {
  require(workers.length == costs.length, "workers/costs must align")
  def isEmpty: Boolean  = workers.isEmpty
  def nonEmpty: Boolean = workers.nonEmpty
  /** Cost of the `rank`-th candidate, or +inf past the known list. */
  def costAt(rank: Int): Double =
    if (rank < costs.length) costs(rank) else Double.PositiveInfinity
}

/** A fully materialized single-task instance: the task plus, for each of its
  * `m` slots, the ranked list of available workers.
  */
final case class TaskInstance(task: Task, slots: Array[SlotCandidates]) {
  require(slots.length == task.m, s"need ${task.m} slots, got ${slots.length}")
  def m: Int = task.m
  /** Cost of executing slot `j` (0-based) with its cheapest free worker. */
  def cost(j: Int): Double = slots(j).costAt(0)
  /** Sum of cheapest costs over all executable slots — the "full assignment"
    * cost used to express budgets as fractions (paper: $50/$100/$200 ≈
    * 12.5/25/50% of the average task cost).
    */
  def fullCost: Double = slots.iterator.filter(_.nonEmpty).map(_.costs(0)).sum
}

/** One executed subtask in an assignment plan. */
final case class Execution(taskId: Int, slot: Int, workerId: Int, cost: Double)

/** Result of running an assignment algorithm on a single task. */
final case class AssignmentResult(
    executedSlots: Vector[Int],
    totalCost: Double,
    quality: Double,
)

/** Shared algorithm parameters (paper defaults bolded in Section V-A). */
final case class TcscParams(
    k: Int = 3,      // k-NN interpolation neighbourhood
    ts: Int = 4,     // tree leaf-segment threshold t_s
) {
  require(k >= 1, "k >= 1")
  require(ts >= 1, "ts >= 1")
}
