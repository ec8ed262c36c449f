package repro.emdata

/** Vocabulary pools with controlled overlap.
  *
  * Frost's Table 2 pins the vocabulary similarity (Jaccard of token sets)
  * between a train and a test dataset. We construct each dataset's pool as
  * global-domain tokens (shared by all datasets of a domain family) plus
  * pair-common tokens (shared by the train/test pair) plus pair-exclusive
  * tokens, so that when both datasets fully use their pools,
  * VS = (|global| + |common|) / (|global| + |common| + 2·|exclusive|).
  */
object Vocab {

  /** Deterministic, readably distinct token for an index. Tokens are ≥ 5
    * chars so they always pass blocking's minimum token length.
    */
  def token(prefix: String, i: Int): String = f"$prefix${i}%05d"

  /** A train/test pool pair with target vocabulary similarity.
    *
    * @param globalSize tokens shared by every dataset of the domain family
    * @param commonSize additional tokens shared by this train/test pair
    * @param exclusiveSize tokens private to each side
    * @param pairTag distinguishes pair-common/exclusive tokens across pairs
    */
  final case class PoolPair(globalSize: Int, commonSize: Int, exclusiveSize: Int, pairTag: String) {
    /** Domain-core tokens shared by every dataset of the family. */
    val globalTokens: IndexedSeq[String] = IndexedSeq.tabulate(globalSize)(token("dom", _))

    /** Tokens shared by this pair's train and test side only. */
    val commonTokens: IndexedSeq[String] = IndexedSeq.tabulate(commonSize)(token(s"c$pairTag", _))

    /** Tokens private to the train side. */
    val trainExclusive: IndexedSeq[String] = IndexedSeq.tabulate(exclusiveSize)(token(s"x$pairTag", _))

    /** Tokens private to the test side. */
    val testExclusive: IndexedSeq[String] = IndexedSeq.tabulate(exclusiveSize)(token(s"z$pairTag", _))

    /** Pool of the train-side dataset. */
    val train: IndexedSeq[String] = globalTokens ++ commonTokens ++ trainExclusive

    /** Pool of the test-side dataset. */
    val test: IndexedSeq[String] = globalTokens ++ commonTokens ++ testExclusive

    /** VS the pools imply when fully used. */
    def designVs: Double =
      (globalSize + commonSize).toDouble / (globalSize + commonSize + 2.0 * exclusiveSize)
  }

  /** Sizes for a pair targeting `vs` with union size `unionSize` over a
    * `globalSize`-token domain core (globalSize must not exceed vs·union).
    */
  def forSimilarity(vs: Double, unionSize: Int, globalSize: Int, pairTag: String): PoolPair = {
    val shared = math.round(vs * unionSize).toInt
    require(shared >= globalSize, s"global core $globalSize exceeds shared budget $shared")
    val exclusive = (unionSize - shared) / 2
    PoolPair(globalSize, shared - globalSize, exclusive, pairTag)
  }
}
