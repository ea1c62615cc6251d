package repro.util

/** Unweighted maximum bipartite matching via augmenting paths (Kuhn's
  * algorithm). Used to compute the error rate of the *optimal monotone
  * classifier* (Table V): any monotone classifier must misclassify at least
  * one endpoint of every "violation" edge (a true match whose similarity
  * vector is dominated by a true non-match's), so the minimum error count is
  * the minimum vertex cover of the violation graph, which by Kőnig's theorem
  * equals the maximum matching size.
  */
object BipartiteMatching {

  /** adj(i) lists the right-side vertices adjacent to left vertex i.
    * Returns the size of a maximum matching.
    */
  def maxMatching(nLeft: Int, nRight: Int, adj: Array[Array[Int]]): Int = {
    val matchRight = Array.fill(nRight)(-1)
    var result = 0
    val visited = new Array[Boolean](nRight)

    def tryKuhn(v: Int): Boolean = {
      var found = false
      var idx = 0
      val edges = adj(v)
      while (idx < edges.length && !found) {
        val to = edges(idx)
        if (!visited(to)) {
          visited(to) = true
          if (matchRight(to) == -1 || tryKuhn(matchRight(to))) {
            matchRight(to) = v
            found = true
          }
        }
        idx += 1
      }
      found
    }

    for (v <- 0 until nLeft) {
      java.util.Arrays.fill(visited, false)
      if (adj(v).nonEmpty && tryKuhn(v)) result += 1
    }
    result
  }
}
