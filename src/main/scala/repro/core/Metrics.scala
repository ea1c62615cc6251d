package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.util.BipartiteMatching

/** Evaluation metrics used across the paper's tables.
  *
  * All inputs are pair DataFrames with columns [id1: Long, id2: Long]
  * (plus extra columns that are ignored).
  */
object Metrics {

  final case class PRF(precision: Double, recall: Double, f1: Double) {
    override def toString: String =
      f"P=${precision * 100}%.1f%% R=${recall * 100}%.1f%% F1=${f1 * 100}%.1f%%"
  }

  private def pairSet(df: DataFrame): Set[(Long, Long)] =
    df.select(col("id1").cast("long"), col("id2").cast("long"))
      .collect()
      .map(r => (r.getLong(0), r.getLong(1)))
      .toSet

  /** Precision/recall/F1 of `found` against `gold` (both pair DataFrames). */
  def prf(found: DataFrame, gold: DataFrame): PRF = prfSets(pairSet(found), pairSet(gold))

  def prfSets(found: Set[(Long, Long)], gold: Set[(Long, Long)]): PRF = {
    if (found.isEmpty) return PRF(0.0, 0.0, 0.0)
    val tp = found.intersect(gold).size.toDouble
    val p = if (found.nonEmpty) tp / found.size else 0.0
    val r = if (gold.nonEmpty) tp / gold.size else 0.0
    val f1 = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    PRF(p, r, f1)
  }

  /** Pair completeness: fraction of gold matches preserved in `pairs` (Table V). */
  def pairCompleteness(pairs: DataFrame, gold: DataFrame): Double = {
    val g = gold.select("id1", "id2").distinct()
    val kept = pairs.select("id1", "id2").distinct().join(g, Seq("id1", "id2")).count()
    val total = g.count()
    if (total == 0) 0.0 else kept.toDouble / total
  }

  /** Reduction ratio: fraction of candidates pruned (Table V). */
  def reductionRatio(before: Long, after: Long): Double =
    if (before == 0) 0.0 else 1.0 - after.toDouble / before

  /** Error rate of the optimal monotone classifier (Table V; [Tao, PODS'18]).
    *
    * A monotone classifier must misclassify one endpoint of every pair
    * (match m, non-match n) with s(n) ⪰ s(m); the minimum number of errors is
    * the min vertex cover of that bipartite violation graph = max matching.
    */
  def optimalMonotoneErrorRate(
      vectors: Seq[(Array[Double], Boolean)]): Double = {
    if (vectors.isEmpty) return 0.0
    val matches = vectors.filter(_._2).map(_._1).toArray
    val nonMatches = vectors.filterNot(_._2).map(_._1).toArray
    if (matches.isEmpty || nonMatches.isEmpty) return 0.0
    def dominates(a: Array[Double], b: Array[Double]): Boolean = {
      var i = 0
      while (i < a.length) { if (a(i) < b(i)) return false; i += 1 }
      true
    }
    val adj = matches.map { m =>
      nonMatches.indices.filter(j => dominates(nonMatches(j), m)).toArray
    }
    val errors = BipartiteMatching.maxMatching(matches.length, nonMatches.length, adj)
    errors.toDouble / vectors.size
  }
}
