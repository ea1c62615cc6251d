package repro.util

/** Hungarian algorithm (Kuhn–Munkres) for maximum-weight 1:1 assignment.
  *
  * Used for the global 1:1 attribute-matching constraint (§IV-C). Attribute
  * counts are small (≤ a few hundred), so the O(n³) driver-side solver is the
  * right tool; the similarity matrix itself is computed distributedly.
  */
object Hungarian {

  /** Maximum-weight assignment on a rows×cols weight matrix.
    * Returns (rowIdx, colIdx) pairs for assigned cells with weight > 0.
    * Rows/cols may be rectangular; the matrix is padded internally.
    */
  def solve(weights: Array[Array[Double]]): Seq[(Int, Int)] = {
    val nRows = weights.length
    if (nRows == 0) return Seq.empty
    val nCols = weights(0).length
    if (nCols == 0) return Seq.empty
    val n = math.max(nRows, nCols)
    // Convert to min-cost with padding; classic potentials formulation (1-indexed).
    val big = weights.iterator.flatMap(_.iterator).foldLeft(0.0)(math.max) + 1.0
    val cost = Array.tabulate(n + 1, n + 1) { (i, j) =>
      if (i == 0 || j == 0) 0.0
      else if (i <= nRows && j <= nCols) big - weights(i - 1)(j - 1)
      else big
    }
    val u = new Array[Double](n + 1)
    val v = new Array[Double](n + 1)
    val p = new Array[Int](n + 1) // p(j) = row matched to column j
    val way = new Array[Int](n + 1)
    for (i <- 1 to n) {
      p(0) = i
      var j0 = 0
      val minv = Array.fill(n + 1)(Double.MaxValue)
      val used = Array.fill(n + 1)(false)
      var done = false
      while (!done) {
        used(j0) = true
        val i0 = p(j0)
        var delta = Double.MaxValue
        var j1 = -1
        for (j <- 1 to n if !used(j)) {
          val cur = cost(i0)(j) - u(i0) - v(j)
          if (cur < minv(j)) { minv(j) = cur; way(j) = j0 }
          if (minv(j) < delta) { delta = minv(j); j1 = j }
        }
        for (j <- 0 to n) {
          if (used(j)) { u(p(j)) += delta; v(j) -= delta }
          else minv(j) -= delta
        }
        j0 = j1
        if (p(j0) == 0) done = true
      }
      while (j0 != 0) {
        val j1 = way(j0)
        p(j0) = p(j1)
        j0 = j1
      }
    }
    (1 to n).flatMap { j =>
      val i = p(j)
      if (i >= 1 && i <= nRows && j <= nCols && weights(i - 1)(j - 1) > 0.0)
        Some((i - 1, j - 1))
      else None
    }
  }
}
