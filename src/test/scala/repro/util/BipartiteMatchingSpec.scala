package repro.util

import repro.PropSpec

class BipartiteMatchingSpec extends PropSpec {

  test("no edges yields 0") {
    assert(BipartiteMatching.maxMatching(3, 3, Array.fill(3)(Array.empty[Int])) == 0)
  }
  test("single edge yields 1") {
    assert(BipartiteMatching.maxMatching(1, 1, Array(Array(0))) == 1)
  }
  test("perfect matching on K2,2") {
    assert(BipartiteMatching.maxMatching(2, 2, Array(Array(0, 1), Array(0, 1))) == 2)
  }
  test("star graph capped at 1") {
    assert(BipartiteMatching.maxMatching(3, 1, Array(Array(0), Array(0), Array(0))) == 1)
  }
  test("augmenting path required") {
    // L0-{R0}, L1-{R0,R1}: greedy on L1 first could block; matching must be 2
    assert(BipartiteMatching.maxMatching(2, 2, Array(Array(0), Array(0, 1))) == 2)
  }
  test("path graph alternation") {
    // L0-{R0}, L1-{R0, R1}, L2-{R1} → max matching 2
    assert(BipartiteMatching.maxMatching(3, 2, Array(Array(0), Array(0, 1), Array(1))) == 2)
  }
  test("matching never exceeds min side") {
    forSeeds() { rnd =>
      val (n, m) = (1 + rnd.nextInt(6), 1 + rnd.nextInt(6))
      val adj = Array.fill(n)((0 until m).filter(_ => rnd.nextBoolean()).toArray)
      val mm = BipartiteMatching.maxMatching(n, m, adj)
      assert(mm <= math.min(n, m))
      assert(mm >= 0)
    }
  }
  test("adding edges never decreases the matching") {
    forSeeds() { rnd =>
      val n = 2 + rnd.nextInt(4)
      val adj = Array.fill(n)((0 until n).filter(_ => rnd.nextDouble() < 0.3).toArray)
      val base = BipartiteMatching.maxMatching(n, n, adj)
      val more = adj.map(a => (a.toSet + rnd.nextInt(n)).toArray)
      assert(BipartiteMatching.maxMatching(n, n, more) >= base)
    }
  }
}
