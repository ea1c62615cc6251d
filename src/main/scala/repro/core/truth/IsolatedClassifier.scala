package repro.core.truth

/** Inference for isolated entity pairs (§VII-B).
  *
  * Match propagation cannot reach vertices with no incident edge, and
  * polling them one by one wastes the budget. The paper reuses the
  * similarity vectors of retained pairs plus the crowd labels to train a
  * random forest: resolved matches are positives; since the propagation
  * yields almost exclusively match labels, *unresolved* retained pairs are
  * treated as negatives to balance the classes. The paper additionally
  * restricts the training set to pairs whose attribute-match sets overlap
  * (Jaccard ≥ ψ = 0.9) with the isolated pair's; our similarity vectors are
  * already aligned on the global attribute-match list M_at, so every
  * retained pair shares the attribute space and that filter is the identity
  * here (noted as a benign simplification in DESIGN.md).
  *
  * Features: the similarity vector extended with the label-similarity prior.
  */
object IsolatedClassifier {

  type Pair = (Long, Long)

  /** Train on resolved/unresolved connected pairs; classify isolated pairs.
    *
    * @param training (pair, features, isMatchLabel)
    * @param isolated (pair, features)
    * @return isolated pairs classified as matches
    */
  def classify(
      training: Seq[(Pair, Array[Double], Boolean)],
      isolated: Seq[(Pair, Array[Double])],
      seed: Long = 13L): Set[Pair] = {
    if (isolated.isEmpty) return Set.empty
    val pos = training.count(_._3)
    val neg = training.size - pos
    if (pos == 0 || neg == 0) return Set.empty // degenerate: nothing learnable
    val forest = new RandomForest(seed = seed)
    forest.fit(training.map(_._2).toArray, training.map(_._3).toArray)
    isolated.filter { case (_, x) => forest.predict(x) }.map(_._1).toSet
  }
}
