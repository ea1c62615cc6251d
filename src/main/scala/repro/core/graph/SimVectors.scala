package repro.core.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.kb.KB
import repro.util.StringSim

/** Similarity-vector construction (§IV-D).
  *
  * For every candidate pair, the similarity vector has one component per
  * attribute match in M_at: component i is sim_L between the pair's value
  * sets on the i-th matched attribute pair (0 when either side is empty).
  *
  * Output columns: [id1, id2, prior, exact, vec: array<double>].
  */
object SimVectors {

  def withVectors(
      spark: SparkSession,
      candidates: DataFrame,
      kb1: KB, kb2: KB,
      attrMatches: Seq[(String, String, Double)],
      literalThreshold: Double = 0.9): DataFrame = {
    import spark.implicits._
    val mAt = attrMatches.map { case (a1, a2, _) => (a1, a2) }
    val dim = mAt.size
    if (dim == 0) return candidates.withColumn("vec", array())

    val idx1 = mAt.zipWithIndex.map { case ((a1, _), i) => (a1, i) }.toDF("attr", "pos")
    val idx2 = mAt.zipWithIndex.map { case ((_, a2), i) => (a2, i) }.toDF("attr", "pos")

    val g1 = kb1.attrs.join(idx1, "attr")
      .groupBy(col("subj").as("id1"), col("pos"))
      .agg(collect_list("value").as("vals1"))
    val g2 = kb2.attrs.join(idx2, "attr")
      .groupBy(col("subj").as("id2"), col("pos"))
      .agg(collect_list("value").as("vals2"))

    val simL = udf((v1: Seq[String], v2: Seq[String]) =>
      StringSim.simL(v1, v2, literalThreshold))

    // Per (pair, pos) similarity; pairs missing a pos get 0 via the final map.
    val comps = candidates.select("id1", "id2")
      .join(g1, "id1").join(g2, Seq("id2", "pos"))
      .withColumn("s", simL(col("vals1"), col("vals2")))
      .groupBy("id1", "id2")
      .agg(collect_list(struct(col("pos"), col("s"))).as("comps"))

    val toVec = udf((comps: Seq[org.apache.spark.sql.Row]) => {
      val v = new Array[Double](dim)
      if (comps != null) comps.foreach(r => v(r.getInt(0)) = r.getDouble(1))
      v
    })
    candidates.join(comps, Seq("id1", "id2"), "left")
      .withColumn("vec", toVec(coalesce(col("comps"), array())))
      .drop("comps")
  }
}
