package repro.core.truth

import repro.PropSpec

class RandomForestSpec extends PropSpec {

  private def separable(n: Int, rnd: scala.util.Random): (Array[Array[Double]], Array[Boolean]) = {
    val xs = Array.fill(n) {
      val pos = rnd.nextBoolean()
      val base = if (pos) 0.8 else 0.2
      Array(base + rnd.nextGaussian() * 0.05, rnd.nextDouble())
    }
    (xs, xs.map(_(0) > 0.5))
  }

  test("learns a linearly separable threshold") {
    val rnd = new scala.util.Random(1)
    val (xs, ys) = separable(200, rnd)
    val f = new RandomForest(nTrees = 30).fit(xs, ys)
    assert(f.predict(Array(0.9, 0.5)))
    assert(!f.predict(Array(0.1, 0.5)))
  }
  test("training accuracy is high on separable data") {
    val rnd = new scala.util.Random(2)
    val (xs, ys) = separable(150, rnd)
    val f = new RandomForest(nTrees = 30).fit(xs, ys)
    val acc = xs.zip(ys).count { case (x, y) => f.predict(x) == y }.toDouble / xs.length
    assert(acc > 0.95)
  }
  test("learns an axis-aligned XOR-free interaction") {
    // positive iff both features high — needs depth ≥ 2
    val rnd = new scala.util.Random(3)
    val xs = Array.fill(300)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val ys = xs.map(x => x(0) > 0.5 && x(1) > 0.5)
    val f = new RandomForest(nTrees = 40).fit(xs, ys)
    assert(f.predict(Array(0.9, 0.9)))
    assert(!f.predict(Array(0.9, 0.1)))
    assert(!f.predict(Array(0.1, 0.9)))
  }
  test("predictProb in [0,1]") {
    forSeeds(10) { rnd =>
      val (xs, ys) = separable(60, rnd)
      val f = new RandomForest(nTrees = 10, seed = rnd.nextLong()).fit(xs, ys)
      val p = f.predictProb(Array(rnd.nextDouble(), rnd.nextDouble()))
      assert(p >= 0.0 && p <= 1.0)
    }
  }
  test("all-positive training predicts positive") {
    val xs = Array.fill(20)(Array(0.5))
    val f = new RandomForest(nTrees = 5).fit(xs, Array.fill(20)(true))
    assert(f.predict(Array(0.5)))
  }
  test("deterministic in seed") {
    val rnd = new scala.util.Random(4)
    val (xs, ys) = separable(80, rnd)
    val p1 = new RandomForest(nTrees = 10, seed = 9).fit(xs, ys).predictProb(Array(0.5, 0.5))
    val p2 = new RandomForest(nTrees = 10, seed = 9).fit(xs, ys).predictProb(Array(0.5, 0.5))
    assert(p1 == p2)
  }
  test("empty training set is rejected") {
    intercept[IllegalArgumentException] {
      new RandomForest().fit(Array.empty, Array.empty)
    }
  }
  test("predict before fit is rejected") {
    intercept[IllegalArgumentException] {
      new RandomForest().predictProb(Array(0.0))
    }
  }
}
