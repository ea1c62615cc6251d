package repro.baselines

import repro.PropSpec
import repro.core.Metrics
import repro.core.truth.WorkerPool

/** Spark-free behavioural tests of the Corleone active-learning loop on
  * controlled feature distributions.
  */
class CorleoneUnitSpec extends PropSpec {
  import CrowdBaselines._

  private def pair(i: Int): (Long, Long) = (i.toLong, 1000000L + i)

  /** iimb-like population: 27% matches; matches have mostly-high vectors with
    * per-component dropout, non-matches mostly-low with collisions.
    */
  private def population(n: Int, seed: Long): (Seq[Cand], Set[(Long, Long)]) = {
    val rnd = new scala.util.Random(seed)
    val cands = (0 until n).map { i =>
      val isMatch = i % 4 == 0
      val vec = Array.fill(12)(
        if (isMatch) { if (rnd.nextDouble() < 0.22) 0.0 else 1.0 }
        else { if (rnd.nextDouble() < 0.08) 1.0 else 0.0 })
      val prior = if (isMatch) (if (rnd.nextDouble() < 0.2) 0.5 else 1.0) else 0.4 + 0.2 * rnd.nextDouble()
      Cand(pair(i), prior, vec, "t")
    }
    (cands, cands.filter(_.pair._1 % 4 == 0).map(_.pair).toSet)
  }

  test("Corleone reaches high F1 on a separable-with-noise population") {
    val (cands, gold) = population(1000, 1)
    val r = Corleone.run(cands, gold, WorkerPool.fixedError(0.05, seed = 3))
    val prf = Metrics.prfSets(r.matches, gold)
    assert(prf.f1 > 0.8, s"$prf with ${r.questions} questions")
  }
  test("Corleone does not classify everything as a match") {
    val (cands, gold) = population(1000, 2)
    val r = Corleone.run(cands, gold, WorkerPool.fixedError(0.05, seed = 4))
    assert(r.matches.size < cands.size * 0.6,
      s"${r.matches.size} of ${cands.size} classified as matches")
    assert(gold.nonEmpty && r.matches.nonEmpty)
  }
  test("Corleone asks a sizeable but bounded number of questions") {
    val (cands, gold) = population(1000, 3)
    val r = Corleone.run(cands, gold, WorkerPool.fixedError(0.05, seed = 5))
    assert(r.questions >= 40 && r.questions <= 404, s"${r.questions}")
  }
}
