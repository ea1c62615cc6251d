package repro.core.prop

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Distant match propagation and inferred-set discovery (§V-C, §VI-B, Alg. 2).
  *
  * The probabilistic ER graph edge (v, v′) has length −log Pr[m_{v′}|m_v];
  * by the Markov chain rule (Eq. 10) the best lower bound on Pr[m_p|m_q] is
  * exp(−dist(q, p)) over the shortest path, so
  *   inferred(q) = { p : dist(q, p) ≤ ζ = −log τ }.
  * The paper's Algorithm 2 is a Floyd–Warshall variant over binary trees; at
  * Spark the same bounded all-pairs reachability is a fixpoint of DataFrame
  * self-joins: the frontier of ζ-bounded paths is repeatedly extended by one
  * edge, min-aggregated, and checkpointed to keep lineage bounded.
  */
object DistantPropagation {

  /** Bounded multi-source shortest paths.
    *
    * `probEdges`: [srcId1, srcId2, dstId1, dstId2, prob];
    * `sources`:   [id1, id2] — the candidate question set C.
    * Returns [qId1, qId2, pId1, pId2, dist] for all dist ≤ ζ, including the
    * trivial (q, q, 0) rows.
    */
  def boundedDistances(
      spark: SparkSession,
      probEdges: DataFrame,
      sources: DataFrame,
      tau: Double,
      maxIters: Int = 12): DataFrame = {
    val zeta = -math.log(tau) + 1e-12
    val edges = probEdges
      .filter(col("prob") > 0)
      .withColumn("len", -log(col("prob")))
      .filter(col("len") <= zeta)
      .select("srcId1", "srcId2", "dstId1", "dstId2", "len")
      .cache()

    var paths = sources.select(
      col("id1").as("qId1"), col("id2").as("qId2"),
      col("id1").as("pId1"), col("id2").as("pId2"),
      lit(0.0).as("dist"))
      .localCheckpoint()

    var prevCount = paths.count()
    var iter = 0
    var converged = false
    while (iter < maxIters && !converged) {
      val extended = paths
        .join(edges,
          paths("pId1") === edges("srcId1") && paths("pId2") === edges("srcId2"))
        .select(col("qId1"), col("qId2"),
          col("dstId1").as("pId1"), col("dstId2").as("pId2"),
          (col("dist") + col("len")).as("dist"))
        .filter(col("dist") <= zeta)
      paths = paths.union(extended)
        .groupBy("qId1", "qId2", "pId1", "pId2")
        .agg(min("dist").as("dist"))
        .localCheckpoint()
      val c = paths.count()
      converged = c == prevCount
      prevCount = c
      iter += 1
    }
    paths
  }

  /** inferred(q) for every source, as [qId1, qId2, pId1, pId2, prob]. */
  def inferredSets(
      spark: SparkSession,
      probEdges: DataFrame,
      sources: DataFrame,
      tau: Double,
      maxIters: Int = 12): DataFrame =
    boundedDistances(spark, probEdges, sources, tau, maxIters)
      .withColumn("prob", exp(-col("dist")))
      .drop("dist")
}
