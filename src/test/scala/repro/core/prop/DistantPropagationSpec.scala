package repro.core.prop

import repro.SparkSpec

class DistantPropagationSpec extends SparkSpec {
  import spark.implicits._

  private def edges(rows: (Long, Long, Long, Long, Double)*) =
    rows.toSeq.toDF("srcId1", "srcId2", "dstId1", "dstId2", "prob")
  private def pairs(ps: (Long, Long)*) = ps.toSeq.toDF("id1", "id2")

  private def collectDists(df: org.apache.spark.sql.DataFrame): Map[((Long, Long), (Long, Long)), Double] =
    df.collect().map(r => (((r.getLong(0), r.getLong(1)), (r.getLong(2), r.getLong(3))),
      r.getDouble(4))).toMap

  test("self distance is zero (prob 1)") {
    val out = DistantPropagation.inferredSets(spark, edges(), pairs((1L, 101L)), 0.9)
    val m = collectDists(out)
    assert(math.abs(m(((1L, 101L), (1L, 101L))) - 1.0) < 1e-12)
  }
  test("one-hop propagation keeps the edge probability") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 0.95)), pairs((1L, 101L)), 0.9)
    val m = collectDists(out)
    assert(math.abs(m(((1L, 101L), (2L, 102L))) - 0.95) < 1e-9)
  }
  test("two-hop product above tau is inferred (Eq. 10 chain)") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 0.96), (2L, 102L, 3L, 103L, 0.96)),
      pairs((1L, 101L)), 0.9)
    val m = collectDists(out)
    assert(math.abs(m(((1L, 101L), (3L, 103L))) - 0.96 * 0.96) < 1e-9)
  }
  test("two-hop product below tau is excluded") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 0.92), (2L, 102L, 3L, 103L, 0.92)),
      pairs((1L, 101L)), 0.9)
    val m = collectDists(out)
    assert(m.contains(((1L, 101L), (2L, 102L))))
    assert(!m.contains(((1L, 101L), (3L, 103L)))) // 0.8464 < 0.9
  }
  test("edges individually below tau never enter the graph") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 0.5)), pairs((1L, 101L)), 0.9)
    assert(collectDists(out).size == 1) // only the self row
  }
  test("shortest path is chosen among alternatives") {
    val out = DistantPropagation.inferredSets(spark,
      edges(
        (1L, 101L, 3L, 103L, 0.91),                          // direct, weaker
        (1L, 101L, 2L, 102L, 0.99), (2L, 102L, 3L, 103L, 0.99)), // via 2, stronger
      pairs((1L, 101L)), 0.9)
    val m = collectDists(out)
    assert(math.abs(m(((1L, 101L), (3L, 103L))) - 0.99 * 0.99) < 1e-9)
  }
  test("multi-source distances are computed per source") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 0.95), (2L, 102L, 1L, 101L, 0.93)),
      pairs((1L, 101L), (2L, 102L)), 0.9)
    val m = collectDists(out)
    assert(math.abs(m(((1L, 101L), (2L, 102L))) - 0.95) < 1e-9)
    assert(math.abs(m(((2L, 102L), (1L, 101L))) - 0.93) < 1e-9)
  }
  test("cycles terminate (fixpoint convergence)") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 0.99), (2L, 102L, 1L, 101L, 0.99)),
      pairs((1L, 101L)), 0.9)
    val m = collectDists(out)
    assert(math.abs(m(((1L, 101L), (1L, 101L))) - 1.0) < 1e-12) // self stays at dist 0
    assert(math.abs(m(((1L, 101L), (2L, 102L))) - 0.99) < 1e-9)
  }
  test("tau = 1 keeps only probability-1 reachability") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 1.0), (2L, 102L, 3L, 103L, 0.99)),
      pairs((1L, 101L)), 1.0)
    val m = collectDists(out)
    assert(m.contains(((1L, 101L), (2L, 102L))))
    assert(!m.contains(((1L, 101L), (3L, 103L))))
  }
  test("inferred probabilities never exceed 1 nor fall below tau") {
    val out = DistantPropagation.inferredSets(spark,
      edges((1L, 101L, 2L, 102L, 0.95), (2L, 102L, 3L, 103L, 0.97),
        (1L, 101L, 3L, 103L, 0.93)),
      pairs((1L, 101L), (2L, 102L), (3L, 103L)), 0.9)
    collectDists(out).values.foreach(p => assert(p >= 0.9 - 1e-9 && p <= 1.0 + 1e-12))
  }
}
