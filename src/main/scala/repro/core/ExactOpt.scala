package repro.core

/** OPT — exact solver for sQM by exhaustive subset enumeration.
  *
  * The paper's OPT "offers the optimal result by traversing the solution
  * space"; it is exponential (sQM is NP-hard, Lemma 3), so like the paper we
  * only run it on small instances (m ≤ 20). Subsets are enumerated as
  * bitmasks with early budget pruning; monotone q means the empty set is the
  * natural floor.
  */
object ExactOpt {
  val MaxM = 20

  def run(inst: TaskInstance, budget: Double, params: TcscParams): AssignmentResult = {
    val m = inst.m
    require(m <= MaxM, s"ExactOpt limited to m <= $MaxM (got $m)")
    val k = params.k
    val cost = Array.tabulate(m)(inst.cost)

    var bestQ = 0.0
    var bestCost = 0.0
    var bestMask = 0
    val limit = 1 << m
    var mask = 0
    while (mask < limit) {
      var c = 0.0
      var i = 0
      var ok = true
      while (i < m && ok) {
        if ((mask & (1 << i)) != 0) {
          c += cost(i)
          if (c > budget) ok = false
        }
        i += 1
      }
      if (ok && mask != 0) {
        val s = new ExecutedSet(m)
        i = 0
        while (i < m) { if ((mask & (1 << i)) != 0) s.add(i); i += 1 }
        val q = Quality.quality(s, k)
        if (q > bestQ) { bestQ = q; bestCost = c; bestMask = mask }
      }
      mask += 1
    }
    val slots = (0 until m).filter(i => (bestMask & (1 << i)) != 0).toVector
    AssignmentResult(slots, bestCost, bestQ)
  }
}
