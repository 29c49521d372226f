package repro.baselines

/** O(n³) Hungarian algorithm (Kuhn–Munkres, potentials formulation) for the
  * linear sum assignment problem — the solver behind the LSAP baseline [14].
  */
object Hungarian {

  /** Minimum-cost perfect matching on a square cost matrix.
    *
    * @return (assignment: row i → column assignment(i), total cost)
    */
  def solve(cost: Array[Array[Double]]): (Array[Int], Double) = {
    val n = cost.length
    require(n > 0 && cost.forall(_.length == n), "cost matrix must be square and non-empty")
    val Inf = Double.MaxValue / 4
    val u = new Array[Double](n + 1)
    val v = new Array[Double](n + 1)
    val p = new Array[Int](n + 1) // column j -> matched row (1-based; 0 = free)
    val way = new Array[Int](n + 1)

    var i = 1
    while (i <= n) {
      p(0) = i
      var j0 = 0
      val minv = Array.fill(n + 1)(Inf)
      val used = new Array[Boolean](n + 1)
      var done = false
      while (!done) {
        used(j0) = true
        val i0 = p(j0)
        var delta = Inf
        var j1 = -1
        var j = 1
        while (j <= n) {
          if (!used(j)) {
            val cur = cost(i0 - 1)(j - 1) - u(i0) - v(j)
            if (cur < minv(j)) { minv(j) = cur; way(j) = j0 }
            if (minv(j) < delta) { delta = minv(j); j1 = j }
          }
          j += 1
        }
        j = 0
        while (j <= n) {
          if (used(j)) { u(p(j)) += delta; v(j) -= delta } else minv(j) -= delta
          j += 1
        }
        j0 = j1
        if (p(j0) == 0) done = true
      }
      while (j0 != 0) { val j1 = way(j0); p(j0) = p(j1); j0 = j1 }
      i += 1
    }

    val assign = new Array[Int](n)
    var j = 1
    while (j <= n) { if (p(j) != 0) assign(p(j) - 1) = j - 1; j += 1 }
    var total = 0.0
    i = 0
    while (i < n) { total += cost(i)(assign(i)); i += 1 }
    (assign, total)
  }
}
