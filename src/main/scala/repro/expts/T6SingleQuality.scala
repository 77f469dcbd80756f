package repro.expts

import repro.core._
import repro.data.TcscGen

/** T6 ≡ Fig 6 — quality of single-task assignment: Approx vs OPT vs Rand,
  * (a) across task-location distributions and (b) across budgets.
  *
  * OPT enumerates the solution space, so — as in the paper's OPT bars — the
  * instances are small (m = 14 by default); quality values are averaged over
  * several independent single-task instances, and Rand over 20 seeds.
  */
object T6SingleQuality {

  final case class Row(section: String, x: String, opt: Double, approx: Double,
                       approxStar: Double, rand: Double)

  def run(nInstances: Int = 5, m: Int = 14, nWorkers: Int = 300,
          seed: Long = 7, params: TcscParams = TcscParams()): Seq[Row] = {
    def measure(dist: TcscGen.Dist, budgetFrac: Double, section: String, x: String): Row = {
      val sc = TcscGen.scenario(nInstances, m, nWorkers, dist, seed)
      var opt = 0.0; var app = 0.0; var star = 0.0; var rnd = 0.0
      sc.instances.foreach { inst =>
        val b = inst.fullCost * budgetFrac
        opt  += ExactOpt.run(inst, b, params).quality
        app  += GreedyNaive.run(inst, b, params).result.quality
        star += GreedyIndexed.run(inst, b, params).result.quality
        rnd  += RandomBaseline.meanQuality(inst, b, params)
      }
      val n = sc.instances.size
      Row(section, x, opt / n, app / n, star / n, rnd / n)
    }

    val byDist = TcscGen.AllDists.map(d =>
      measure(d, 0.25, "Fig6a:distribution", d.name))
    val byBudget = Seq(0.125, 0.25, 0.5).map(b =>
      measure(TcscGen.Uniform, b, "Fig6b:budget", f"$b%.3f"))
    byDist ++ byBudget
  }

  def render(rows: Seq[Row]): Seq[String] =
    Harness.printTable("T6 (Fig 6): single-task quality",
      Seq("section", "x", "OPT", "Approx", "Approx*", "Rand"),
      rows.map(r => Harness.row(r.section, r.x, r.opt, r.approx, r.approxStar, r.rand)))
}
