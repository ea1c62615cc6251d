package repro.baselines
import repro.SparkSpec
import repro.core.Metrics
import repro.core.truth.WorkerPool
import repro.tables.Tables
class TwinDiagSpec extends SparkSpec {
  test("twin diagnostics on iimb") {
    val c = Tables.ctx(spark, "iimb", 0.25)
    val twins = c.prepared.priors.keySet.filter { case (a, b) => b - 1000000L == a + 1 || b - 1000000L == a - 1 }
    info(s"retained=${c.prepared.priors.size} gold=${c.gold.size} twinPairs=${twins.size}")
    val r = Corleone.run(c.candFeatures, c.gold, WorkerPool.fixedError(0.05, seed = 104))
    val twinsClassified = twins.intersect(r.matches)
    info(s"corleone questions=${r.questions} matches=${r.matches.size} twinFP=${twinsClassified.size}")
    info(s"corleone ${Metrics.prfSets(r.matches, c.gold)}")
    // feature stats
    val twinFeats = c.candFeatures.filter(f => twins.contains(f.pair))
    val noisyMatchFeats = c.candFeatures.filter(f => c.gold.contains(f.pair) && f.prior < 0.9)
    def stats(s: Seq[CrowdBaselines.Cand], tag: String): Unit =
      if (s.nonEmpty) info(f"$tag n=${s.size} avgPrior=${s.map(_.prior).sum / s.size}%.2f avgVecSum=${s.map(_.vec.sum).sum / s.size}%.2f")
    stats(twinFeats, "twins")
    stats(noisyMatchFeats, "noisyMatches")
  }
}
