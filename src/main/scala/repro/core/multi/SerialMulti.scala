package repro.core.multi

import repro.core._

/** Outcome of a multi-task assignment run. */
final case class MultiOutcome(
    perTask: Vector[AssignmentResult],
    executions: Vector[Execution],
    totalCost: Double,
    qSum: Double,
    qMin: Double,
    commits: Int,
    evals: Long,
    conflicts: Long,
    wallNanos: Long,
)

/** Serial multi-task assignment (Section IV).
  *
  * `basic` is the unparallelized MSQM baseline of Fig 9 (a): every iteration
  * re-enumerates all |T| tasks' candidate subtasks to find the global
  * maximum heuristic value, so it scales quadratically with |T| (the paper's
  * O(|T|² m log³ m) analysis). `minQuality` is the MMQM solver: a heap keyed
  * by current task quality; the minimum-quality task executes one greedy
  * step per pop (no worker-conflict machinery needed — commits are strictly
  * sequential).
  *
  * Both share the global `WorkerPool` cost model: a subtask's cost is the
  * travel distance of its cheapest *still-free* worker, so a taken worker
  * pushes competing tasks to their 2nd-, 3rd-, … nearest (Fig 4).
  */
object SerialMulti {
  private val Eps = 1e-12

  private[multi] final class TaskCtx(val inst: TaskInstance, params: TcscParams) {
    val st = new QualityState(inst.m, params.k)
    val singles: Array[Double] = Singletons.qualities(inst.m, params.k)
    val order = Vector.newBuilder[Int]
    var spent = 0.0
    def deltaQ(j: Int): Double =
      if (st.executedCount == 0) singles(j) else st.deltaQ(j)
    def result: AssignmentResult = AssignmentResult(order.result(), spent, st.quality)
  }

  private[multi] def outcome(ctxs: IndexedSeq[TaskCtx], execs: Vector[Execution],
                             commits: Int, evals: Long, conflicts: Long,
                             nanos: Long): MultiOutcome = {
    val per = ctxs.map(_.result).toVector
    MultiOutcome(per, execs, per.map(_.totalCost).sum, per.map(_.quality).sum,
      if (per.isEmpty) 0.0 else per.map(_.quality).min,
      commits, evals, conflicts, nanos)
  }

  /** Count tasks whose current cheapest candidate at `slot` is `worker`
    * (they will be pushed to a worse rank by this commit) and mark them via
    * `onConflict`.
    */
  private[multi] def registerConflicts(
      ctxs: IndexedSeq[TaskCtx], pool: WorkerPool, committer: Int,
      slot: Int, worker: Int, onConflict: Int => Unit): Long = {
    var c = 0L
    var i = 0
    while (i < ctxs.length) {
      if (i != committer && !ctxs(i).st.isExecuted(slot)) {
        val sc = ctxs(i).inst.slots(slot)
        val fr = pool.freeRank(sc, slot)
        if (fr >= 0 && fr < sc.workers.length && sc.workers(fr) == worker) {
          c += 1
          onConflict(i)
        }
      }
      i += 1
    }
    c
  }

  /** MSQM, basic serial greedy (no index reuse across iterations, no
    * parallelism): the Fig 9 (a) "basic" competitor.
    */
  def basic(instances: Seq[TaskInstance], budget: Double,
            params: TcscParams): MultiOutcome = {
    val t0 = System.nanoTime()
    val ctxs = instances.map(new TaskCtx(_, params)).toIndexedSeq
    val pool = new WorkerPool
    val execs = Vector.newBuilder[Execution]
    var spent = 0.0
    var commits = 0
    var evals = 0L
    var conflicts = 0L
    var continue = true
    while (continue) {
      var bi = -1; var bj = -1; var bh = Double.NegativeInfinity
      var bRank = -1; var bCost = 0.0
      var i = 0
      while (i < ctxs.length) {
        val ctx = ctxs(i)
        var j = 0
        while (j < ctx.inst.m) {
          if (!ctx.st.isExecuted(j)) {
            val rank = pool.freeRank(ctx.inst.slots(j), j)
            if (rank >= 0) {
              val cost = ctx.inst.slots(j).costs(rank)
              if (spent + cost <= budget) {
                val h = ctx.deltaQ(j) / math.max(cost, Eps)
                evals += 1
                if (h > bh) { bh = h; bi = i; bj = j; bRank = rank; bCost = cost }
              }
            }
          }
          j += 1
        }
        i += 1
      }
      if (bi < 0) continue = false
      else {
        val ctx = ctxs(bi)
        val w = ctx.inst.slots(bj).workers(bRank)
        conflicts += registerConflicts(ctxs, pool, bi, bj, w, _ => ())
        require(pool.tryTake(w, bj), "serial take cannot race")
        ctx.st.insert(bj)
        ctx.order += bj
        ctx.spent += bCost
        spent += bCost
        execs += Execution(ctx.inst.task.id, bj, w, bCost)
        commits += 1
      }
    }
    outcome(ctxs, execs.result(), commits, evals, conflicts, System.nanoTime() - t0)
  }

  /** MMQM (Problem 3): maximize the minimum task quality. A min-heap over
    * current task qualities; each pop executes one Algorithm-1 greedy step
    * for the weakest task. `indexed = false` recomputes marginals with the
    * naive full scan (Approx); `indexed = true` uses the windowed engine
    * (Approx*) — identical plans, different cost.
    */
  def minQuality(instances: Seq[TaskInstance], budget: Double,
                 params: TcscParams, indexed: Boolean = true): MultiOutcome = {
    val t0 = System.nanoTime()
    val ctxs = instances.map(new TaskCtx(_, params)).toIndexedSeq
    val pool = new WorkerPool
    val execs = Vector.newBuilder[Execution]
    var spent = 0.0
    var commits = 0
    var evals = 0L
    var conflicts = 0L
    // (quality, taskId) min-heap via sorted set semantics on a PQ.
    val heap = scala.collection.mutable.PriorityQueue.empty[(Double, Int)](
      Ordering.by((e: (Double, Int)) => (e._1, e._2)).reverse) // min quality, then min id
    ctxs.indices.foreach(i => heap.enqueue((0.0, i)))
    while (heap.nonEmpty) {
      val (_, i) = heap.dequeue()
      val ctx = ctxs(i)
      // One greedy step for the weakest task.
      var bj = -1; var bh = Double.NegativeInfinity; var bRank = -1; var bCost = 0.0
      var j = 0
      while (j < ctx.inst.m) {
        if (!ctx.st.isExecuted(j)) {
          val rank = pool.freeRank(ctx.inst.slots(j), j)
          if (rank >= 0) {
            val cost = ctx.inst.slots(j).costs(rank)
            if (spent + cost <= budget) {
              val dq = if (!indexed) {
                if (ctx.st.executedCount == 0) ctx.singles(j)
                else GreedyNaive.deltaQNaive(ctx.st.executed, params.k, j)
              } else ctx.deltaQ(j)
              evals += 1
              val h = dq / math.max(cost, Eps)
              if (h > bh) { bh = h; bj = j; bRank = rank; bCost = cost }
            }
          }
        }
        j += 1
      }
      if (bj >= 0) {
        val w = ctx.inst.slots(bj).workers(bRank)
        conflicts += registerConflicts(ctxs, pool, i, bj, w, _ => ())
        require(pool.tryTake(w, bj), "serial take cannot race")
        ctx.st.insert(bj)
        ctx.order += bj
        ctx.spent += bCost
        spent += bCost
        execs += Execution(ctx.inst.task.id, bj, w, bCost)
        commits += 1
        heap.enqueue((ctx.st.quality, i)) // re-enter with updated quality
      }
      // A task with no affordable candidate leaves the heap for good.
    }
    outcome(ctxs, execs.result(), commits, evals, conflicts, System.nanoTime() - t0)
  }
}
