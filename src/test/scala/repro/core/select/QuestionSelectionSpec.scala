package repro.core.select

import repro.PropSpec

class QuestionSelectionSpec extends PropSpec {
  import QuestionSelection._

  private def p(i: Int): Pair = (i.toLong, 1000000L + i)

  private val inferred: Map[Pair, Seq[Pair]] = Map(
    p(1) -> Seq(p(1), p(2), p(3), p(4)),
    p(2) -> Seq(p(2)),
    p(5) -> Seq(p(5), p(6)),
    p(7) -> Seq(p(7), p(8), p(9)))
  private val priors: Map[Pair, Double] =
    Map(p(1) -> 0.9, p(2) -> 0.95, p(5) -> 0.8, p(7) -> 0.7)
  private val all: Set[Pair] = (1 to 9).map(p).toSet

  // --- benefit ---
  test("benefit of empty set is 0") {
    assert(benefit(Set.empty, inferred, priors, all) == 0.0)
  }
  test("benefit of one question is prior times coverage") {
    assert(math.abs(benefit(Set(p(1)), inferred, priors, all) - 0.9 * 4) < 1e-9)
  }
  test("benefit respects the unresolved filter") {
    val b = benefit(Set(p(1)), inferred, priors, Set(p(2)))
    assert(math.abs(b - 0.9) < 1e-9)
  }
  test("benefit of overlapping questions uses noisy-or") {
    val inf = Map(p(1) -> Seq(p(3)), p(2) -> Seq(p(3)))
    val b = benefit(Set(p(1), p(2)), inf, Map(p(1) -> 0.5, p(2) -> 0.5), Set(p(3)))
    assert(math.abs(b - 0.75) < 1e-9)
  }
  test("benefit is monotone increasing") {
    forSeeds() { rnd =>
      val qs = priors.keySet.toSeq
      val q1 = qs.filter(_ => rnd.nextBoolean()).toSet
      val extra = qs(rnd.nextInt(qs.size))
      assert(benefit(q1 + extra, inferred, priors, all) >= benefit(q1, inferred, priors, all) - 1e-12)
    }
  }
  test("benefit is submodular (Theorem 2)") {
    forSeeds() { rnd =>
      val qs = priors.keySet.toSeq
      val base = qs.filter(_ => rnd.nextBoolean()).toSet
      val rest = qs.filterNot(base.contains)
      if (rest.size >= 2) {
        val q1 = rest.head
        val q2 = rest(1)
        val lhs = benefit(base + q1, inferred, priors, all) - benefit(base, inferred, priors, all)
        val rhs = benefit(base + q1 + q2, inferred, priors, all) - benefit(base + q2, inferred, priors, all)
        assert(lhs >= rhs - 1e-12)
      }
    }
  }

  // --- greedy selection ---
  test("greedy picks the highest-benefit question first") {
    val sel = selectGreedy(inferred, priors, priors.keySet, all, 1)
    assert(sel == Seq(p(1))) // 0.9*4 = 3.6 beats all others
  }
  test("greedy respects mu") {
    assert(selectGreedy(inferred, priors, priors.keySet, all, 2).size == 2)
  }
  test("greedy ignores zero-benefit questions") {
    val sel = selectGreedy(inferred, priors, priors.keySet, Set.empty, 10)
    assert(sel.isEmpty)
  }
  test("greedy matches exhaustive optimum on small instances") {
    forSeeds(30) { rnd =>
      val n = 5
      val inf = (1 to n).map { i =>
        p(i) -> (Seq(p(i)) ++ (1 to n).filter(_ => rnd.nextBoolean()).map(p))
      }.toMap
      val pri = (1 to n).map(i => p(i) -> (0.2 + 0.8 * rnd.nextDouble())).toMap
      val universe = (1 to n).map(p).toSet
      val sel = selectGreedy(inf, pri, universe, universe, 2)
      val best = universe.subsets(2).map(q => benefit(q, inf, pri, universe)).max
      val got = benefit(sel.toSet, inf, pri, universe)
      // (1 − 1/e) guarantee; in practice greedy is near-optimal here
      assert(got >= best * (1 - 1.0 / math.E) - 1e-9)
    }
  }

  // --- MaxInf / MaxPr ---
  test("MaxInf picks the largest inferred set") {
    assert(selectMaxInf(inferred, priors.keySet, all, 1) == Seq(p(1)))
  }
  test("MaxInf counts only unresolved pairs") {
    val sel = selectMaxInf(inferred, priors.keySet, Set(p(5), p(6)), 1)
    assert(sel == Seq(p(5)))
  }
  test("MaxPr picks the highest prior") {
    assert(selectMaxPr(priors, priors.keySet, 1) == Seq(p(2)))
  }
  test("MaxPr respects mu and ordering") {
    assert(selectMaxPr(priors, priors.keySet, 2) == Seq(p(2), p(1)))
  }
}
