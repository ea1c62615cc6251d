package repro.core

import repro.PropSpec

class MetricsSpec extends PropSpec {

  private def p(i: Int): (Long, Long) = (i.toLong, 1000000L + i)

  // --- PRF ---
  test("perfect match set") {
    val g = Set(p(1), p(2))
    val m = Metrics.prfSets(g, g)
    assert(m.precision == 1.0 && m.recall == 1.0 && m.f1 == 1.0)
  }
  test("empty found set") {
    assert(Metrics.prfSets(Set.empty, Set(p(1))).f1 == 0.0)
  }
  test("half precision full recall") {
    val m = Metrics.prfSets(Set(p(1), p(2)), Set(p(1)))
    assert(m.precision == 0.5 && m.recall == 1.0)
    assert(math.abs(m.f1 - 2.0 / 3.0) < 1e-9)
  }
  test("disjoint sets give zero f1") {
    assert(Metrics.prfSets(Set(p(1)), Set(p(2))).f1 == 0.0)
  }
  test("f1 is the harmonic mean") {
    forSeeds(20) { rnd =>
      val gold = (0 until 10).map(p).toSet
      val found = (0 until 15).filter(_ => rnd.nextBoolean()).map(p).toSet
      if (found.nonEmpty) {
        val m = Metrics.prfSets(found, gold)
        val expected =
          if (m.precision + m.recall == 0) 0.0
          else 2 * m.precision * m.recall / (m.precision + m.recall)
        assert(math.abs(m.f1 - expected) < 1e-12)
      }
    }
  }

  // --- reduction ratio ---
  test("reduction ratio of no pruning is 0") {
    assert(Metrics.reductionRatio(100, 100) == 0.0)
  }
  test("reduction ratio of full pruning is 1") {
    assert(Metrics.reductionRatio(100, 0) == 1.0)
  }
  test("reduction ratio handles zero candidates") {
    assert(Metrics.reductionRatio(0, 0) == 0.0)
  }

  // --- optimal monotone error rate ---
  test("monotone-consistent data has zero error") {
    val vs = Seq(
      (Array(0.9, 0.9), true),
      (Array(0.8, 0.9), true),
      (Array(0.2, 0.1), false),
      (Array(0.1, 0.1), false))
    assert(Metrics.optimalMonotoneErrorRate(vs) == 0.0)
  }
  test("one violation forces one error") {
    val vs = Seq(
      (Array(0.2, 0.2), true),   // match dominated by...
      (Array(0.9, 0.9), false),  // ...a non-match
      (Array(0.5, 0.5), true))
    // wait: (0.5,0.5) match also dominated by the non-match ⇒ still 1 error
    // (classifying the non-match as match fixes both violations)
    assert(math.abs(Metrics.optimalMonotoneErrorRate(vs) - 1.0 / 3) < 1e-9)
  }
  test("two independent violations force two errors") {
    val vs = Seq(
      (Array(0.1, 0.9), true), (Array(0.2, 0.95), false),
      (Array(0.9, 0.1), true), (Array(0.95, 0.2), false))
    assert(math.abs(Metrics.optimalMonotoneErrorRate(vs) - 0.5) < 1e-9)
  }
  test("all matches yields zero error") {
    assert(Metrics.optimalMonotoneErrorRate(Seq((Array(0.5), true), (Array(0.2), true))) == 0.0)
  }
  test("empty input yields zero error") {
    assert(Metrics.optimalMonotoneErrorRate(Seq.empty) == 0.0)
  }
  test("incomparable vectors never conflict") {
    val vs = Seq((Array(0.9, 0.1), false), (Array(0.1, 0.9), true))
    assert(Metrics.optimalMonotoneErrorRate(vs) == 0.0)
  }
  test("equal vectors with different labels conflict") {
    val vs = Seq((Array(0.5, 0.5), true), (Array(0.5, 0.5), false))
    assert(math.abs(Metrics.optimalMonotoneErrorRate(vs) - 0.5) < 1e-9)
  }
  test("error rate bounded by the minority class share") {
    forSeeds(20) { rnd =>
      val vs = Seq.fill(12)((Array(rnd.nextDouble(), rnd.nextDouble()), rnd.nextBoolean()))
      val e = Metrics.optimalMonotoneErrorRate(vs)
      val minority = math.min(vs.count(_._2), vs.count(!_._2)).toDouble / vs.size
      assert(e >= 0.0 && e <= minority + 1e-12)
    }
  }
}
