package repro.tables

import repro.SparkSpec

/** Harness-level coverage of the per-table entrypoints at test scale.
  * The expensive crowd-loop tables (III, VI, VII) are exercised by the bench
  * suites; here we check the cheap tables end-to-end plus rendering.
  */
class TablesSpec extends SparkSpec {

  private val scale = 0.25

  test("render produces an aligned grid") {
    val s = Tables.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = s.split("\n")
    assert(lines.head == "== T ==")
    assert(lines.tail.map(_.length).distinct.size == 1) // all rows same width
  }
  test("ctx caches per (profile, scale, seed)") {
    val a = Tables.ctx(spark, "iimb", scale)
    val b = Tables.ctx(spark, "iimb", scale)
    assert(a eq b)
  }
  test("table II reports sane statistics at test scale") {
    val (rendered, stats) = Tables.tableII(spark, scale)
    assert(rendered.contains("IIMB") && rendered.contains("D-Y"))
    assert(stats.size == 4)
    stats.foreach(s => assert(s.e1 > 0 && s.matches > 0))
  }
  test("table IV runs and the 1:1 constraint never hurts precision") {
    val (_, rows) = Tables.tableIV(spark, scale)
    rows.foreach(r => assert(r.with11.precision >= r.no11.precision - 1e-9))
  }
  test("table V pruning preserves pair completeness at test scale") {
    val (_, rows) = Tables.tableV(spark, scale)
    rows.foreach { r =>
      assert(r.nRetained <= r.nCand)
      assert(r.retainedPC >= r.candPC - 0.05)
    }
  }
  test("table VIII isolated fraction ordering holds at test scale") {
    val (_, rows) = Tables.tableVIII(spark, scale)
    val byName = rows.map(r => r.profile -> r).toMap
    assert(byName("dy").isolatedMatchFrac > byName("iimb").isolatedMatchFrac)
  }
  test("candFeatures align with retained pairs") {
    val c = Tables.ctx(spark, "iimb", scale)
    assert(c.candFeatures.size == c.prepared.priors.size)
    c.candFeatures.foreach(f => assert(c.prepared.priors.contains(f.pair)))
  }
}
