package repro.core.multi

import repro.core._
import java.util.concurrent.{Callable, Executors}
import scala.jdk.CollectionConverters._

/** Group-level parallelization of MSQM (Section IV-A-1).
  *
  * Tasks are first partitioned into independent groups — connected
  * components of the worker-conflict graph obtained by gradually expanding
  * NN bounds (`ConflictGraph`). Groups never compete for workers, so each
  * group's greedy runs concurrently on the thread pool, each with a budget
  * share proportional to its size (b·|G|/|T|; the global budget cannot be
  * enforced across independent groups without reintroducing the
  * coordination this variant avoids — documented interpretation, DESIGN.md).
  *
  * The paper's drawback reproduces naturally: skewed task distributions
  * yield a few large groups that dominate wall-clock time and cap the
  * speedup (Fig 9 (a)-(b)).
  */
object GroupParallel {

  final case class GroupOutcome(
      outcome: MultiOutcome,
      groups: Int,
      largestGroup: Int,
      graphRounds: Int,
  )

  def run(instances: Seq[TaskInstance],
          workerPos: Seq[(Int, Double, Double)],
          budget: Double, params: TcscParams, threads: Int): GroupOutcome = {
    val t0 = System.nanoTime()
    val inst = instances.toIndexedSeq
    val graph = ConflictGraph.build(inst, workerPos)
    val total = inst.size.toDouble
    val execPool = Executors.newFixedThreadPool(math.max(1, threads))
    val jobs = graph.groups.map { members =>
      new Callable[(Vector[Int], MultiOutcome)] {
        def call(): (Vector[Int], MultiOutcome) = {
          val share = budget * members.size / total
          val (out, _) = TaskParallel.run(members.map(inst(_)), share, params, threads = 1)
          (members, out)
        }
      }
    }
    val results = execPool.invokeAll(jobs.asJava).asScala.map(_.get()).toVector
    execPool.shutdown()

    // Stitch per-group outputs back into task order.
    val perTask = Array.fill(inst.size)(AssignmentResult(Vector.empty, 0.0, 0.0))
    val execs = Vector.newBuilder[Execution]
    var commits = 0; var evals = 0L; var conflicts = 0L
    for ((members, out) <- results) {
      members.zip(out.perTask).foreach { case (tid, r) => perTask(tid) = r }
      execs ++= out.executions
      commits += out.commits; evals += out.evals; conflicts += out.conflicts
    }
    val per = perTask.toVector
    val outcome = MultiOutcome(per, execs.result(), per.map(_.totalCost).sum,
      per.map(_.quality).sum,
      if (per.isEmpty) 0.0 else per.map(_.quality).min,
      commits, evals, conflicts, System.nanoTime() - t0)
    GroupOutcome(outcome, graph.groups.size,
      graph.groups.map(_.size).maxOption.getOrElse(0), graph.rounds)
  }
}
