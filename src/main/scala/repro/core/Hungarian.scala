package repro.core

/** Hungarian algorithm (Kuhn–Munkres with potentials), O(n²·m) for an
  * n×m cost matrix with n <= m. Solves the assignment problem: a minimum-cost
  * matching that assigns every row to a distinct column.
  *
  * Used for the exact SLD computation (min-weight perfect matching on the
  * token bigraph) and, negated, for the max-weight fuzzy token matching of
  * the Wang et al. baselines.
  */
object Hungarian {

  /** Returns `(totalCost, assignment)` where `assignment(i)` is the column
    * assigned to row `i`. Requires `cost.length <= cost(0).length`.
    */
  def solve(cost: Array[Array[Double]]): (Double, Array[Int]) = {
    val n = cost.length
    if (n == 0) return (0.0, Array.empty)
    val m = cost(0).length
    require(n <= m, s"Hungarian needs rows <= cols, got $n x $m")
    val INF = Double.MaxValue / 4
    val u = new Array[Double](n + 1)
    val v = new Array[Double](m + 1)
    val p = new Array[Int](m + 1) // p(j): row matched to column j (0 = none)
    val way = new Array[Int](m + 1)
    var i = 1
    while (i <= n) {
      p(0) = i
      var j0 = 0
      val minv = Array.fill(m + 1)(INF)
      val used = new Array[Boolean](m + 1)
      var done = false
      while (!done) {
        used(j0) = true
        val i0 = p(j0)
        var delta = INF
        var j1 = -1
        var j = 1
        while (j <= m) {
          if (!used(j)) {
            val cur = cost(i0 - 1)(j - 1) - u(i0) - v(j)
            if (cur < minv(j)) { minv(j) = cur; way(j) = j0 }
            if (minv(j) < delta) { delta = minv(j); j1 = j }
          }
          j += 1
        }
        j = 0
        while (j <= m) {
          if (used(j)) { u(p(j)) += delta; v(j) -= delta }
          else minv(j) -= delta
          j += 1
        }
        j0 = j1
        if (p(j0) == 0) done = true
      }
      // Augment along the alternating path.
      while (j0 != 0) {
        val j1 = way(j0)
        p(j0) = p(j1)
        j0 = j1
      }
      i += 1
    }
    val assignment = new Array[Int](n)
    var total = 0.0
    var j = 1
    while (j <= m) {
      if (p(j) != 0) {
        assignment(p(j) - 1) = j - 1
        total += cost(p(j) - 1)(j - 1)
      }
      j += 1
    }
    (total, assignment)
  }

  /** Minimum assignment cost for an integer cost matrix. */
  def minCost(cost: Array[Array[Int]]): Int = {
    val d = cost.map(_.map(_.toDouble))
    math.round(solve(d)._1).toInt
  }

  /** Maximum-weight assignment for a non-negative weight matrix (rows <= cols):
    * returns `(totalWeight, assignment)`. Solved by negating the weights.
    */
  def maxWeight(weights: Array[Array[Double]]): (Double, Array[Int]) = {
    val neg = weights.map(_.map(w => -w))
    val (c, a) = solve(neg)
    (-c, a)
  }
}
