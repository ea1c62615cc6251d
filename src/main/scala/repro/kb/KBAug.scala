package repro.kb

import org.apache.spark.sql.functions._

/** Inverse-relationship augmentation.
  *
  * The ER graph (Definition 2) is directed along relationship triples, so
  * match information only flows subject → object. Real KBs are traversed in
  * both directions by collective ER systems (PARIS explicitly models inverse
  * functionality), and the paper's propagation examples rely on it. Adding an
  * inverse triple (o, inv__r, s) for every (s, r, o) makes every edge
  * traversable both ways with its own consistency estimate — e.g. on a
  * DBLP/ACM-style corpus the single authorship relation then connects
  * publications through shared authors, which is what gives Remp its low
  * question counts there.
  */
object KBAug {
  val InvPrefix = "inv__"

  def withInverses(kb: KB): KB =
    kb.copy(rels = kb.rels.union(
      kb.rels.select(
        col("obj").as("subj"),
        concat(lit(InvPrefix), col("rel")).as("rel"),
        col("subj").as("obj"))))
}
