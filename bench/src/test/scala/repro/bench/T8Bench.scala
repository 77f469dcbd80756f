package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.T8SingleEfficiency

/** T8 ≡ Fig 8: single-task efficiency (Approx vs Approx*). */
class T8Bench extends AnyFunSuite {
  test("T8: single-task efficiency table") {
    val cells = T8SingleEfficiency.run()
    T8SingleEfficiency.render(cells)
    def series(section: String, s: String): Seq[(String, Double)] =
      cells.filter(c => c.section == section && c.series == s).map(c => (c.x, c.value))

    // (a) Approx* dominates Approx, increasingly with m.
    val a = series("Fig8a:time_vs_m", "Approx").zip(series("Fig8a:time_vs_m", "Approx*"))
    a.foreach { case ((x, naive), (_, star)) =>
      assert(star < naive, s"m=$x: Approx* $star !< Approx $naive")
    }
    val speedups = a.map { case ((_, n), (_, s)) => n / math.max(s, 1e-9) }
    assert(speedups.last > speedups.head,
      s"speedup should grow with m: $speedups")
    assert(speedups.last > 10, s"expected >10x at the largest m, got $speedups")

    // (d) pruning ratio is substantial (paper: >70%).
    val ratios = cells.filter(_.section == "Fig8d:pruning_vs_m").map(_.value)
    assert(ratios.forall(_ > 0.5), s"weak pruning: $ratios")

    // (e) larger t_s → fewer nodes.
    val nodes = cells.filter(c => c.section == "Fig8e:tree_vs_ts" && c.series == "tree_nodes")
      .map(_.value)
    assert(nodes == nodes.sorted.reverse, s"tree nodes not decreasing in t_s: $nodes")
  }
}
