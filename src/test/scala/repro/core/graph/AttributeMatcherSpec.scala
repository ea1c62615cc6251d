package repro.core.graph

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestKBs}

class AttributeMatcherSpec extends SparkSpec {
  import spark.implicits._

  private lazy val (kb1, kb2) = TestKBs.figure1(spark)
  private lazy val mIn = TestKBs.figure1Gold.toSeq.toDF("id1", "id2")
  private lazy val sims = AttributeMatcher.attributeSimilarities(spark, kb1, kb2, mIn).cache()

  test("identical-value attribute pairs get similarity 1") {
    val born = sims.filter($"a1" === "y_born" && $"a2" === "d_born").collect()
    assert(born.length == 1 && born(0).getDouble(born(0).fieldIndex("sim")) == 1.0)
  }
  test("cross attribute pairs get low similarity") {
    val cross = sims.filter($"a1" === "y_born" && $"a2" === "d_year").collect()
    cross.foreach(r => assert(r.getDouble(r.fieldIndex("sim")) < 0.5))
  }
  test("1:1 matching recovers the renamed attribute alignment") {
    val m = AttributeMatcher.matchAttributes(sims).map(t => (t._1, t._2)).toSet
    assert(m == Set(("y_born", "d_born"), ("y_year", "d_year"), ("y_pop", "d_pop")))
  }
  test("1:1 matching is injective on both sides") {
    val m = AttributeMatcher.matchAttributes(sims)
    assert(m.map(_._1).distinct.size == m.size)
    assert(m.map(_._2).distinct.size == m.size)
  }
  test("no-1:1 variant is a superset of 1:1 under the same threshold") {
    val m11 = AttributeMatcher.matchAttributes(sims).map(t => (t._1, t._2)).toSet
    val mAll = AttributeMatcher.matchAttributesNo11(sims).map(t => (t._1, t._2)).toSet
    assert(m11.subsetOf(mAll))
  }
  test("attribute similarity denominator counts one-sided support (Eq. 1)") {
    // Give KB1 an attribute that only half the matched entities carry; its
    // values always agree, but sim_A must be diluted by the one-sided rows.
    val attrs1 = (kb1.attrs.collect().map(r => (r.getLong(0), r.getString(1), r.getString(2))) ++
      Seq((TestKBs.Joan, "y_rare", "zzz"))).toSeq.toDF("subj", "attr", "value")
    val attrs2 = (kb2.attrs.collect().map(r => (r.getLong(0), r.getString(1), r.getString(2))) ++
      Seq((TestKBs.Joan + TestKBs.Off, "d_rare", "zzz"),
        (TestKBs.John + TestKBs.Off, "d_rare", "qqq"))).toSeq.toDF("subj", "attr", "value")
    val kb1b = kb1.copy(attrs = attrs1)
    val kb2b = kb2.copy(attrs = attrs2)
    val s = AttributeMatcher.attributeSimilarities(spark, kb1b, kb2b, mIn)
      .filter($"a1" === "y_rare" && $"a2" === "d_rare").collect()
    // numerator: 1 (Joan); denominator: pairs(y_rare)=1 + pairs(d_rare)=2 − both=1 = 2
    assert(s.length == 1 && math.abs(s(0).getDouble(s(0).fieldIndex("sim")) - 0.5) < 1e-9)
  }
  test("empty initial matches yield no similarities") {
    val empty = Seq.empty[(Long, Long)].toDF("id1", "id2")
    assert(AttributeMatcher.attributeSimilarities(spark, kb1, kb2, empty).count() == 0)
  }
  test("matchAttributes on empty sims is empty") {
    val empty = Seq.empty[(String, String, Double)].toDF("a1", "a2", "sim")
    assert(AttributeMatcher.matchAttributes(empty).isEmpty)
  }
  test("minSim filters weak matches") {
    val m = AttributeMatcher.matchAttributes(sims, minSim = 1.01)
    assert(m.isEmpty)
  }
  test("synthetic dy profile: 1:1 restores renamed gold attributes with high precision") {
    val pair = repro.synth.KBPairGen.generate(spark,
      repro.synth.KBPairGen.profile("dy", scale = 0.12))
    val cands = CandidateGen.candidates(pair.kb1, pair.kb2, 0.3)
    val s = AttributeMatcher.attributeSimilarities(spark, pair.kb1, pair.kb2,
      CandidateGen.initialMatches(cands))
    val found = AttributeMatcher.matchAttributes(s).map(t => (t._1, t._2)).toSet
    val gold = pair.goldAttrMatches.toSet
    val tp = found.intersect(gold).size.toDouble
    assert(found.nonEmpty)
    assert(tp / found.size > 0.7, s"precision ${tp / found.size} on $found")
  }
}
