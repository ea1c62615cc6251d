package repro.core.truth

import repro.PropSpec

class IsolatedClassifierSpec extends PropSpec {

  private def pair(i: Int): (Long, Long) = (i.toLong, 1000000L + i)

  test("classifies isolated pairs like the training distribution") {
    val pos = (0 until 40).map(i => (pair(i), Array(0.9, 0.85), true))
    val neg = (40 until 80).map(i => (pair(i), Array(0.1, 0.15), false))
    val isolated = Seq((pair(100), Array(0.88, 0.9)), (pair(101), Array(0.12, 0.1)))
    val out = IsolatedClassifier.classify(pos ++ neg, isolated)
    assert(out == Set(pair(100)))
  }
  test("no isolated pairs yields empty set") {
    val pos = Seq((pair(0), Array(0.9), true), (pair(1), Array(0.1), false))
    assert(IsolatedClassifier.classify(pos, Seq.empty).isEmpty)
  }
  test("degenerate all-positive training yields empty (nothing learnable)") {
    val pos = (0 until 10).map(i => (pair(i), Array(0.9), true))
    assert(IsolatedClassifier.classify(pos, Seq((pair(99), Array(0.9)))).isEmpty)
  }
  test("degenerate all-negative training yields empty") {
    val neg = (0 until 10).map(i => (pair(i), Array(0.1), false))
    assert(IsolatedClassifier.classify(neg, Seq((pair(99), Array(0.1)))).isEmpty)
  }
  test("deterministic in seed") {
    val train = (0 until 30).map(i => (pair(i), Array(i / 30.0), i >= 15))
    val iso = (100 until 110).map(i => (pair(i), Array((i - 100) / 10.0)))
    assert(IsolatedClassifier.classify(train, iso, seed = 5) ==
      IsolatedClassifier.classify(train, iso, seed = 5))
  }
}
