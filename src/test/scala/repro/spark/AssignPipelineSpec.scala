package repro.spark

import repro.SparkSpec
import repro.core.{Quality, TcscParams}
import repro.core.multi.TaskParallel
import repro.data.TcscGen

/** End-to-end Spark assignment pipeline vs the driver-side engine. */
class AssignPipelineSpec extends SparkSpec {
  private val params = TcscParams()

  private lazy val sc = TcscGen.scenario(nTasks = 12, m = 24, nWorkers = 250,
    TcscGen.Uniform, seed = 101)

  test("conflict edges are valid task pairs") {
    import spark.implicits._
    val tasks = AssignPipeline.tasksDf(spark, sc)
    val workers = AssignPipeline.workersDf(spark, sc)
    val edges = AssignPipeline.conflictEdges(spark, tasks, workers, radius = 0.1)
      .as[(Int, Int)].collect()
    edges.foreach { case (a, b) =>
      assert(a < b && a >= 0 && b < sc.tasks.size)
    }
  }

  test("groups assign every task exactly once") {
    val groupOf = AssignPipeline.groups(10, Seq((0, 1), (1, 2), (5, 6)))
    assert(groupOf.length == 10)
    assert(groupOf(0) == groupOf(1) && groupOf(1) == groupOf(2))
    assert(groupOf(5) == groupOf(6))
    assert(groupOf(3) != groupOf(0) && groupOf(3) != groupOf(5))
  }

  test("union-find handles chains and cycles") {
    val g = AssignPipeline.groups(6, Seq((0, 1), (1, 2), (2, 0), (3, 4), (4, 5)))
    assert(g(0) == g(1) && g(1) == g(2))
    assert(g(3) == g(4) && g(4) == g(5))
    assert(g(0) != g(3))
  }

  test("Spark assignment equals the driver-side per-group engine") {
    import spark.implicits._
    val execsDs = AssignPipeline.assign(spark, sc, budgetFraction = 0.25, params)
    val sparkExecs = execsDs.collect().toVector
      .sortBy(e => (e.taskId, e.slot))

    // Rebuild the same groups and run the same per-group serial greedy.
    val tasks = AssignPipeline.tasksDf(spark, sc)
    val workers = AssignPipeline.workersDf(spark, sc)
    val edges = AssignPipeline.conflictEdges(spark, tasks, workers, 0.08)
      .as[(Int, Int)].collect().toSeq
    val groupOf = AssignPipeline.groups(sc.tasks.size, edges)
    val budget = TcscGen.budgetFor(sc.instances, 0.25)
    val expected = groupOf.zipWithIndex.groupBy(_._1).toSeq.flatMap { case (_, members) =>
      val ids = members.map(_._2).sorted.toVector
      val share = budget * ids.size / sc.tasks.size
      val (out, _) = TaskParallel.run(ids.map(sc.instances(_)), share, params, 1)
      out.executions
    }.sortBy(e => (e.taskId, e.slot)).toVector

    assert(sparkExecs == expected)
  }

  test("pipeline qualities match the core metric per task") {
    import spark.implicits._
    val execs = AssignPipeline.assign(spark, sc, 0.25, params).collect().toVector
    val qDf = AssignPipeline.planQualities(spark, sc, execs.toDF(), params.k)
    val got = qDf.collect().map(r => r.getInt(0) -> r.getDouble(1)).toMap
    val bySlots = execs.groupBy(_.taskId).view.mapValues(_.map(_.slot)).toMap
    sc.tasks.foreach { t =>
      val expected = Quality.qualityOf(t.m, bySlots.getOrElse(t.id, Vector.empty), params.k)
      assert(math.abs(got.getOrElse(t.id, 0.0) - expected) < 1e-9, s"task ${t.id}")
    }
  }

  test("no worker-slot double booking in the Spark plan") {
    val execs = AssignPipeline.assign(spark, sc, 0.25, params).collect()
    val pairs = execs.map(e => (e.workerId, e.slot)).toSeq
    assert(pairs.distinct.size == pairs.size)
  }
}
