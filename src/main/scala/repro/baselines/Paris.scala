package repro.baselines

import org.apache.spark.sql.DataFrame
import repro.kb.KB

/** PARIS baseline [Suchanek et al., VLDB'11] — probabilistic, functionality-
  * weighted match propagation without crowdsourcing (used in Table VI).
  *
  * Match probabilities start at 1 for the seed matches and are iteratively
  * re-estimated: an edge labelled (r1, r2) transfers evidence proportional to
  * the *functionality* of both relationships (≈ 1/avg fan-out), the noisy-or
  * of all incoming evidence giving the new probability. This mirrors PARIS's
  * fixed-point over alignment probabilities; like PARIS, it has no crowd and
  * accumulates errors through multi-valued relationships — the behaviour
  * Table VI probes. The final alignment keeps, per entity, its best-scoring
  * counterpart with probability ≥ 0.5 (greedy 1:1).
  */
object Paris {

  type Pair = (Long, Long)

  /** fanout-based functionality: #distinct subjects / #triples (and the
    * inverse for reverse traversal).
    */
  private def functionalities(kb: KB): (Map[String, Double], Map[String, Double]) = {
    val rows = kb.rels.groupBy("rel")
      .agg(org.apache.spark.sql.functions.countDistinct("subj").as("ns"),
        org.apache.spark.sql.functions.countDistinct("obj").as("no"),
        org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)).as("nt"))
      .collect()
    val fwd = rows.map(r => r.getString(0) -> r.getLong(1).toDouble / r.getLong(3)).toMap
    val rev = rows.map(r => r.getString(0) -> r.getLong(2).toDouble / r.getLong(3)).toMap
    (fwd, rev)
  }

  /** Run from seeds over the ER graph edges.
    *
    * @param edges ER graph edges [srcId1, srcId2, dstId1, dstId2, r1, r2]
    */
  def run(edges: DataFrame, kb1: KB, kb2: KB, seeds: Set[Pair],
          iterations: Int = 8, threshold: Double = 0.5): Set[Pair] = {
    val (f1, r1f) = functionalities(kb1)
    val (f2, r2f) = functionalities(kb2)
    val rawEdges = edges.collect().map { r =>
      ((r.getLong(0), r.getLong(1)), (r.getLong(2), r.getLong(3)),
        r.getString(4), r.getString(5))
    }
    // Undirected propagation edges with functionality weights, max per pair.
    val prop = collection.mutable.Map.empty[(Pair, Pair), Double]
    for ((s, d, rr1, rr2) <- rawEdges) {
      val wF = f1.getOrElse(rr1, 0.5) * f2.getOrElse(rr2, 0.5)
      val wR = r1f.getOrElse(rr1, 0.5) * r2f.getOrElse(rr2, 0.5)
      prop((s, d)) = math.max(prop.getOrElse((s, d), 0.0), wF)
      prop((d, s)) = math.max(prop.getOrElse((d, s), 0.0), wR)
    }
    val bySrc = prop.toSeq.groupBy(_._1._1)
      .view.mapValues(_.map { case ((_, d), w) => (d, w) }).toMap

    var probs: Map[Pair, Double] = seeds.map(_ -> 1.0).toMap
    for (_ <- 1 to iterations) {
      val next = collection.mutable.Map.empty[Pair, Double]
      for ((src, p) <- probs if p > 1e-3; (dst, w) <- bySrc.getOrElse(src, Seq.empty)) {
        val old = next.getOrElse(dst, 0.0)
        next(dst) = 1.0 - (1.0 - old) * (1.0 - w * p)
      }
      for (s <- seeds) next(s) = 1.0
      probs = next.toMap
    }

    // Greedy 1:1: best counterpart per entity above threshold.
    val used1 = collection.mutable.Set.empty[Long]
    val used2 = collection.mutable.Set.empty[Long]
    val out = collection.mutable.Set.empty[Pair]
    for (((p1, p2), _) <- probs.toSeq.filter(_._2 >= threshold).sortBy(-_._2)) {
      if (!used1(p1) && !used2(p2)) { used1 += p1; used2 += p2; out += ((p1, p2)) }
    }
    out.toSet ++ seeds
  }
}
