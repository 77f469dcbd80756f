package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.T11SpatioTemporal

/** T11 ≡ Fig 11: spatiotemporal interpolation quality. */
class T11Bench extends AnyFunSuite {
  test("T11: spatiotemporal quality table") {
    val cells = T11SpatioTemporal.run()
    T11SpatioTemporal.render(cells)
    def at(section: String, x: String, s: String): Double =
      cells.find(c => c.section == section && c.x == x && c.series == s).get.value

    // SApprox >= Approx >= Rand under the combined score, per distribution.
    for (x <- Seq("uniform", "gaussian", "zipf", "poi")) {
      val s = at("Fig11a:distribution", x, "SApprox")
      val a = at("Fig11a:distribution", x, "Approx")
      val r = at("Fig11a:distribution", x, "Rand")
      assert(s >= a - 1e-6, s"$x: SApprox $s < Approx $a")
      assert(s >= r - 1e-6, s"$x: SApprox $s < Rand $r")
    }
    // Tiny-instance OPT dominates both greedy variants.
    val opt = at("Fig11opt:tiny", "T=2,m=6", "OPT")
    val sTiny = at("Fig11opt:tiny", "T=2,m=6", "SApprox")
    val aTiny = at("Fig11opt:tiny", "T=2,m=6", "Approx")
    assert(opt >= sTiny - 1e-9 && opt >= aTiny - 1e-9)
    assert(sTiny >= (1 - 1 / math.sqrt(math.E)) * opt - 1e-9,
      "SApprox below the approximation bound on the tiny instance")
  }
}
