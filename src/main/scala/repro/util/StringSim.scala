package repro.util

/** String/literal similarity primitives used throughout ER graph construction.
  *
  * The paper (§IV-B) normalises entity labels (lowercasing, tokenisation,
  * stemming), measures token-set Jaccard for candidate generation, and uses an
  * "extended Jaccard" `sim_L` over literal sets (§IV-C) with an internal
  * literal similarity (token Jaccard for strings, max percentage difference
  * for numbers) and a 0.9 threshold.
  */
object StringSim {

  /** Lowercase, strip punctuation, split on whitespace, light suffix stemming.
    * Deterministic and cheap — runs inside Spark UDF-style maps.
    */
  def normalizeTokens(label: String): Array[String] = {
    if (label == null) return Array.empty
    label.toLowerCase
      .replaceAll("[^a-z0-9 ]", " ")
      .split("\\s+")
      .filter(_.nonEmpty)
      .map(stem)
  }

  /** Porter-lite stemmer: only the high-frequency inflections matter for
    * matching synthetic/real labels; full Porter adds nothing here.
    */
  def stem(t: String): String = {
    if (t.length > 4 && t.endsWith("ing")) t.dropRight(3)
    else if (t.length > 3 && t.endsWith("ed")) t.dropRight(2)
    else if (t.length > 3 && t.endsWith("es")) t.dropRight(2)
    else if (t.length > 2 && t.endsWith("s")) t.dropRight(1)
    else t
  }

  /** Jaccard coefficient of two token sets. Empty ∪ empty defined as 0. */
  def jaccard(a: Set[String], b: Set[String]): Double = {
    if (a.isEmpty && b.isEmpty) 0.0
    else {
      val inter = a.intersect(b).size
      inter.toDouble / (a.size + b.size - inter)
    }
  }

  def jaccardTokens(a: String, b: String): Double =
    jaccard(normalizeTokens(a).toSet, normalizeTokens(b).toSet)

  /** Internal literal similarity (§IV-C): numbers compare by maximum
    * percentage difference, strings by token Jaccard.
    */
  def literalSim(a: String, b: String): Double = {
    (parseNum(a), parseNum(b)) match {
      case (Some(x), Some(y)) =>
        if (x == y) 1.0
        else {
          val denom = math.max(math.abs(x), math.abs(y))
          if (denom == 0.0) 1.0 else math.max(0.0, 1.0 - math.abs(x - y) / denom)
        }
      case _ => jaccardTokens(a, b)
    }
  }

  def parseNum(s: String): Option[Double] =
    if (s == null) None
    else try { Some(s.trim.toDouble) } catch { case _: NumberFormatException => None }

  /** Extended Jaccard sim_L over two literal sets (§IV-C): a literal counts as
    * shared when its best counterpart reaches `threshold`; shared literals are
    * greedily matched 1:1. Returns |shared| / |union-like denominator|.
    */
  def simL(n1: Seq[String], n2: Seq[String], threshold: Double = 0.9): Double = {
    if (n1.isEmpty && n2.isEmpty) return 0.0
    if (n1.isEmpty || n2.isEmpty) return 0.0
    // Greedy 1:1 pairing in descending similarity; sets are tiny (attr values).
    val pairs = for {
      (a, i) <- n1.zipWithIndex
      (b, j) <- n2.zipWithIndex
      s = literalSim(a, b) if s >= threshold
    } yield (s, i, j)
    val usedA = collection.mutable.Set[Int]()
    val usedB = collection.mutable.Set[Int]()
    var matched = 0
    for ((_, i, j) <- pairs.sortBy(-_._1)) {
      if (!usedA(i) && !usedB(j)) { usedA += i; usedB += j; matched += 1 }
    }
    matched.toDouble / (n1.size + n2.size - matched)
  }
}
