package repro.util

import repro.PropSpec

class HungarianSpec extends PropSpec {

  private def weightOf(w: Array[Array[Double]], assign: Seq[(Int, Int)]): Double =
    assign.map { case (i, j) => w(i)(j) }.sum

  private def bruteForceBest(w: Array[Array[Double]]): Double = {
    val rows = w.indices
    val cols = w(0).indices
    // enumerate all partial injective assignments
    def rec(r: Int, used: Set[Int]): Double =
      if (r == rows.size) 0.0
      else {
        val skip = rec(r + 1, used)
        val opts = cols.filterNot(used).map(c => w(r)(c) + rec(r + 1, used + c))
        (skip +: opts).max
      }
    rec(0, Set.empty)
  }

  test("empty matrix") {
    assert(Hungarian.solve(Array.empty).isEmpty)
  }
  test("1x1 positive weight") {
    assert(Hungarian.solve(Array(Array(0.7))) == Seq((0, 0)))
  }
  test("1x1 zero weight excluded") {
    assert(Hungarian.solve(Array(Array(0.0))).isEmpty)
  }
  test("identity-dominant 3x3 picks diagonal") {
    val w = Array(
      Array(0.9, 0.1, 0.1),
      Array(0.1, 0.8, 0.1),
      Array(0.1, 0.1, 0.7))
    assert(Hungarian.solve(w).toSet == Set((0, 0), (1, 1), (2, 2)))
  }
  test("anti-diagonal optimum found") {
    val w = Array(
      Array(0.1, 0.9),
      Array(0.9, 0.1))
    assert(Hungarian.solve(w).toSet == Set((0, 1), (1, 0)))
  }
  test("rectangular: more columns than rows") {
    val w = Array(Array(0.2, 0.9, 0.3))
    assert(Hungarian.solve(w) == Seq((0, 1)))
  }
  test("rectangular: more rows than columns") {
    val w = Array(Array(0.2), Array(0.9), Array(0.3))
    assert(Hungarian.solve(w) == Seq((1, 0)))
  }
  test("assignment is injective on both sides") {
    forSeeds() { rnd =>
      val (n, m) = (1 + rnd.nextInt(5), 1 + rnd.nextInt(5))
      val w = Array.fill(n, m)(rnd.nextDouble())
      val a = Hungarian.solve(w)
      assert(a.map(_._1).distinct.size == a.size)
      assert(a.map(_._2).distinct.size == a.size)
    }
  }
  test("matches brute force optimum on random matrices") {
    forSeeds() { rnd =>
      val (n, m) = (1 + rnd.nextInt(4), 1 + rnd.nextInt(4))
      val w = Array.fill(n, m)(rnd.nextDouble())
      val a = Hungarian.solve(w)
      assert(math.abs(weightOf(w, a) - bruteForceBest(w)) < 1e-9)
    }
  }
}
