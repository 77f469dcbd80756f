package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.T7MultiQuality

/** T7 ≡ Fig 7: multi-task quality (q_sum and q_min, Approx vs Rand). */
class T7Bench extends AnyFunSuite {
  test("T7: multi-task quality table") {
    val rows = T7MultiQuality.run()
    T7MultiQuality.render(rows)
    rows.foreach { r =>
      assert(r.approx >= r.rand - 1e-6,
        s"${r.metric}/${r.section}/${r.x}: Approx ${r.approx} below Rand ${r.rand}")
    }
    // q_sum should beat Rand clearly at the default budget.
    val qsum = rows.filter(r => r.metric == "q_sum" && r.section == "Fig7ac:distribution")
    qsum.foreach(r => assert(r.approx > r.rand, s"${r.x}: no q_sum improvement"))
  }
}
