package repro.util

import repro.PropSpec

class StringSimSpec extends PropSpec {

  // --- normalizeTokens ---
  test("normalize lowercases") {
    assert(StringSim.normalizeTokens("Hello World").toSeq == Seq("hello", "world"))
  }
  test("normalize strips punctuation") {
    assert(StringSim.normalizeTokens("a,b.c!d").toSeq == Seq("a", "b", "c", "d"))
  }
  test("normalize handles null") {
    assert(StringSim.normalizeTokens(null).isEmpty)
  }
  test("normalize handles empty") {
    assert(StringSim.normalizeTokens("   ").isEmpty)
  }
  test("normalize keeps digits") {
    assert(StringSim.normalizeTokens("n42").toSeq == Seq("n42"))
  }

  // --- stem ---
  test("stem drops plural es") { assert(StringSim.stem("movies") == "movi") }
  test("stem drops plural s") { assert(StringSim.stem("films") == "film") }
  test("stem drops ing") { assert(StringSim.stem("matching") == "match") }
  test("stem drops ed") { assert(StringSim.stem("matched") == "match") }
  test("stem keeps short words") { assert(StringSim.stem("as") == "as") }
  test("stem keeps non-inflected") { assert(StringSim.stem("paris") == "pari") }

  // --- jaccard ---
  test("jaccard identical sets is 1") {
    assert(StringSim.jaccard(Set("a", "b"), Set("a", "b")) == 1.0)
  }
  test("jaccard disjoint sets is 0") {
    assert(StringSim.jaccard(Set("a"), Set("b")) == 0.0)
  }
  test("jaccard both empty is 0 by convention") {
    assert(StringSim.jaccard(Set.empty, Set.empty) == 0.0)
  }
  test("jaccard half overlap") {
    assert(StringSim.jaccard(Set("a", "b"), Set("b", "c")) == 1.0 / 3.0)
  }
  test("jaccardTokens normalizes before comparing") {
    assert(StringSim.jaccardTokens("The Movie", "the movie") == 1.0)
  }
  private def randTokens(rnd: scala.util.Random): Set[String] =
    Set.fill(rnd.nextInt(5))(s"t${rnd.nextInt(6)}")

  test("jaccard is symmetric") {
    forSeeds() { rnd =>
      val (a, b) = (randTokens(rnd), randTokens(rnd))
      assert(StringSim.jaccard(a, b) == StringSim.jaccard(b, a))
    }
  }
  test("jaccard in [0,1]") {
    forSeeds() { rnd =>
      val j = StringSim.jaccard(randTokens(rnd), randTokens(rnd))
      assert(j >= 0.0 && j <= 1.0)
    }
  }

  // --- literalSim ---
  test("numeric equal is 1") { assert(StringSim.literalSim("42", "42.0") == 1.0) }
  test("numeric 10 percent difference") {
    assert(math.abs(StringSim.literalSim("100", "90") - 0.9) < 1e-12)
  }
  test("numeric far apart near 0") {
    assert(StringSim.literalSim("1", "1000") < 0.01)
  }
  test("numeric zero vs zero is 1") { assert(StringSim.literalSim("0", "0") == 1.0) }
  test("string falls back to token jaccard") {
    assert(StringSim.literalSim("alpha beta", "alpha beta") == 1.0)
  }
  test("mixed number and string compares as strings") {
    assert(StringSim.literalSim("42", "fortytwo") == 0.0)
  }
  test("parseNum parses doubles and rejects words") {
    assert(StringSim.parseNum("3.5").contains(3.5))
    assert(StringSim.parseNum("abc").isEmpty)
    assert(StringSim.parseNum(null).isEmpty)
  }

  // --- simL (extended Jaccard over literal sets) ---
  test("simL identical singleton sets") {
    assert(StringSim.simL(Seq("alpha"), Seq("alpha")) == 1.0)
  }
  test("simL empty sets is 0") {
    assert(StringSim.simL(Seq.empty, Seq.empty) == 0.0)
    assert(StringSim.simL(Seq("a"), Seq.empty) == 0.0)
  }
  test("simL partial overlap") {
    // one matched of (2 + 1 - 1) = 0.5
    assert(StringSim.simL(Seq("alpha", "beta"), Seq("alpha")) == 0.5)
  }
  test("simL respects internal threshold") {
    // "alpha beta" vs "alpha gamma": token jaccard 1/3 < 0.9 ⇒ no match
    assert(StringSim.simL(Seq("alpha beta"), Seq("alpha gamma")) == 0.0)
  }
  test("simL numeric values within threshold") {
    assert(StringSim.simL(Seq("100"), Seq("95")) == 1.0) // 0.95 ≥ 0.9
    assert(StringSim.simL(Seq("100"), Seq("80")) == 0.0) // 0.8 < 0.9
  }
  test("simL greedy 1:1 does not double count") {
    // both left literals match the single right literal; only one can pair
    assert(StringSim.simL(Seq("alpha", "alpha"), Seq("alpha")) == 0.5)
  }
  test("simL symmetric") {
    val xs = Seq("alpha", "beta x", "42")
    val ys = Seq("alpha", "41")
    assert(StringSim.simL(xs, ys) == StringSim.simL(ys, xs))
  }
  test("simL bounded by 1") {
    val pool = Seq("a", "b", "c", "1", "2")
    forSeeds() { rnd =>
      val a = Seq.fill(3)(pool(rnd.nextInt(pool.size)))
      val b = Seq.fill(3)(pool(rnd.nextInt(pool.size)))
      val s = StringSim.simL(a, b)
      assert(s >= 0.0 && s <= 1.0)
    }
  }
}
