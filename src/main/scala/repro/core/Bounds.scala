package repro.core

/** Greedy lower/upper bounds on the table unionability score (paper §4.3).
  *
  * Both bounds sort the τ-surviving edges by weight descending and scan:
  *  - UB allows a node to appear in several edges (relaxed matching) and
  *    stops once all nodes on one side are covered or edges run out — a
  *    superset-dominance argument makes the prefix sum an upper bound.
  *  - LB keeps the one-edge-per-node constraint (greedy maximal matching),
  *    which is feasible, hence a lower bound.
  * Both run in O(|E| log |E| + n), far cheaper than exact matching.
  */
object Bounds {

  /** Edges (i, j, w) with w ≥ τ, sorted by weight descending. */
  def edges(sim: Array[Array[Double]], tau: Double): IndexedSeq[(Int, Int, Double)] = {
    val out = scala.collection.mutable.ArrayBuffer[(Int, Int, Double)]()
    var i = 0
    while (i < sim.length) {
      var j = 0
      while (j < sim(i).length) {
        if (sim(i)(j) >= tau) out += ((i, j, sim(i)(j)))
        j += 1
      }
      i += 1
    }
    out.sortBy(-_._3).toIndexedSeq
  }

  /** UB(S,T): greedy prefix with node reuse, stopping at one-side coverage. */
  def upperBound(sim: Array[Array[Double]], tau: Double): Double = {
    if (sim.isEmpty || sim(0).isEmpty) return 0.0
    val m = sim.length; val n = sim(0).length
    val coveredS = new Array[Boolean](m)
    val coveredT = new Array[Boolean](n)
    var cs = 0; var ct = 0
    var total = 0.0
    val it = edges(sim, tau).iterator
    var stop = false
    while (it.hasNext && !stop) {
      val (i, j, w) = it.next()
      total += w
      if (!coveredS(i)) { coveredS(i) = true; cs += 1 }
      if (!coveredT(j)) { coveredT(j) = true; ct += 1 }
      if (cs == m || ct == n) stop = true
    }
    total
  }

  /** LB(S,T): greedy conflict-free matching (each node in ≤ 1 edge). */
  def lowerBound(sim: Array[Array[Double]], tau: Double): Double = {
    if (sim.isEmpty || sim(0).isEmpty) return 0.0
    val m = sim.length; val n = sim(0).length
    val usedS = new Array[Boolean](m)
    val usedT = new Array[Boolean](n)
    var total = 0.0
    edges(sim, tau).foreach { case (i, j, w) =>
      if (!usedS(i) && !usedT(j)) {
        usedS(i) = true; usedT(j) = true
        total += w
      }
    }
    total
  }
}
