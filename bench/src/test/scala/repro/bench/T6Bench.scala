package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.T6SingleQuality

/** T6 ≡ Fig 6: single-task quality (Approx vs OPT vs Rand). */
class T6Bench extends AnyFunSuite {
  test("T6: single-task quality table") {
    val rows = T6SingleQuality.run()
    T6SingleQuality.render(rows)
    val bound = 1.0 - 1.0 / math.sqrt(math.E)
    rows.foreach { r =>
      assert(r.approx <= r.opt + 1e-9, s"${r.section}/${r.x}: Approx above OPT")
      assert(r.approx >= bound * r.opt - 1e-9,
        s"${r.section}/${r.x}: approximation ratio violated")
      assert(math.abs(r.approx - r.approxStar) < 1e-9,
        s"${r.section}/${r.x}: Approx* deviates from Approx")
      assert(r.approx >= r.rand - 1e-6,
        s"${r.section}/${r.x}: Approx ${r.approx} below Rand ${r.rand}")
    }
    // Fig 6 (b) shape: the Approx-Rand gap shrinks as the budget grows.
    val byBudget = rows.filter(_.section == "Fig6b:budget")
    val gaps = byBudget.map(r => r.approx - r.rand)
    assert(gaps.head >= gaps.last - 1e-6,
      s"gap should be largest at the smallest budget: $gaps")
  }
}
