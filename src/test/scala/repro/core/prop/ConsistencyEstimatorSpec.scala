package repro.core.prop

import repro.{SparkSpec, TestKBs}
import repro.kb.KB

class ConsistencyEstimatorSpec extends SparkSpec {
  import spark.implicits._

  test("bestLTerm is 0 when either side is empty") {
    assert(ConsistencyEstimator.bestLTerm(0, 5, 2.0) == 0.0)
    assert(ConsistencyEstimator.bestLTerm(5, 0, 2.0) == 0.0)
  }
  test("bestLTerm prefers L>0 for attractive odds") {
    assert(ConsistencyEstimator.bestLTerm(2, 2, math.log(81.0)) > 0.0)
  }
  test("bestLTerm stays at L=0 for repulsive odds") {
    assert(ConsistencyEstimator.bestLTerm(2, 2, math.log(1e-6)) == 0.0)
  }
  test("bestLTerm grows with set sizes under attractive odds") {
    val lz = math.log(10.0)
    assert(ConsistencyEstimator.bestLTerm(4, 4, lz) >
      ConsistencyEstimator.bestLTerm(2, 2, lz))
  }

  private def kbOf(rels: Seq[(Long, String, Long)], side: Int): KB = {
    val ids = rels.flatMap(r => Seq(r._1, r._3)).distinct
    KB.fromLocal(spark,
      ids.map(i => (i, s"e$i", "t")),
      Seq.empty,
      rels)
  }

  test("perfectly consistent functional relationship gets high epsilon") {
    // 20 matched subjects, each with exactly one matched value on both sides
    val rels1 = (0 until 20).map(i => (i.toLong, "r1", 100L + i))
    val rels2 = (0 until 20).map(i => (1000L + i, "r2", 1100L + i))
    val mIn = ((0 until 20).map(i => (i.toLong, 1000L + i)) ++
      (0 until 20).map(i => (100L + i, 1100L + i))).toDF("id1", "id2")
    val eps = ConsistencyEstimator.estimate(spark, kbOf(rels1, 1), kbOf(rels2, 2), mIn)
    val c = eps(("r1", "r2"))
    assert(c.eps1 > 0.8, s"eps1=${c.eps1}")
    assert(c.eps2 > 0.8, s"eps2=${c.eps2}")
  }
  test("one-sided-only relationship gets low epsilon") {
    // r1 exists for matched subjects; r2 never does ⇒ no co-occurrence rows,
    // so the pair is absent from the estimate entirely.
    val rels1 = (0 until 10).map(i => (i.toLong, "r1", 100L + i))
    val rels2 = Seq((5000L, "r2", 6000L)) // unmatched subject
    val mIn = (0 until 10).map(i => (i.toLong, 1000L + i)).toDF("id1", "id2")
    val eps = ConsistencyEstimator.estimate(spark, kbOf(rels1, 1), kbOf(rels2, 2), mIn)
    assert(!eps.contains(("r1", "r2")))
  }
  test("dropout lowers the estimated consistency") {
    def run(dropEvery: Int): ConsistencyEstimator.Consistency = {
      val n = 30
      val rels1 = (0 until n).map(i => (i.toLong, "r1", 100L + i))
      // KB2 drops every `dropEvery`-th counterpart value
      val rels2 = (0 until n).filter(_ % dropEvery != 0)
        .map(i => (1000L + i, "r2", 1100L + i))
      val mIn = ((0 until n).map(i => (i.toLong, 1000L + i)) ++
        (0 until n).map(i => (100L + i, 1100L + i))).toDF("id1", "id2")
      ConsistencyEstimator.estimate(spark, kbOf(rels1, 1), kbOf(rels2, 2), mIn)(("r1", "r2"))
    }
    val light = run(10) // 10% dropped
    val heavy = run(2)  // 50% dropped
    assert(light.eps1 > heavy.eps1, s"light=$light heavy=$heavy")
  }
  test("epsilons always lie strictly inside (0,1)") {
    val (kb1, kb2) = TestKBs.figure1(spark)
    val mIn = TestKBs.figure1Gold.toSeq.toDF("id1", "id2")
    val eps = ConsistencyEstimator.estimate(spark, kb1, kb2, mIn)
    assert(eps.nonEmpty)
    eps.values.foreach { c =>
      assert(c.eps1 > 0.0 && c.eps1 < 1.0)
      assert(c.eps2 > 0.0 && c.eps2 < 1.0)
    }
  }
  test("figure-1 aligned relationships are more consistent than crossed ones") {
    val (kb1, kb2) = TestKBs.figure1(spark)
    val mIn = TestKBs.figure1Gold.toSeq.toDF("id1", "id2")
    val eps = ConsistencyEstimator.estimate(spark, kb1, kb2, mIn)
    val aligned = eps(("y_directed", "d_directed"))
    assert(aligned.eps1 >= 0.5 && aligned.eps2 >= 0.5, s"aligned=$aligned")
    for (crossed <- eps.get(("y_directed", "d_wasBornIn")))
      assert(crossed.eps1 <= aligned.eps1 + 1e-9)
  }
  test("degreeHistogram counts value-set sizes per relationship pair") {
    val (kb1, kb2) = TestKBs.figure1(spark)
    val mIn = TestKBs.figure1Gold.toSeq.toDF("id1", "id2")
    val h = ConsistencyEstimator.degreeHistogram(spark, kb1, kb2, mIn).collect()
    val timDirected = h.find(r => r.getString(0) == "y_directed" && r.getString(1) == "d_directed")
    assert(timDirected.isDefined)
    assert(timDirected.get.getLong(2) == 2 && timDirected.get.getLong(3) == 2) // Tim directs 2 movies
  }
}
