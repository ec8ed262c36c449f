package repro.core

import repro.unionfind.{DynamicIntersection, UnionFind}

/** A match proposed by a matching solution: two record indices and the
  * similarity/confidence score the solution assigned to the pair.
  */
final case class ScoredMatch(a: Int, b: Int, score: Double)

/** Metric/metric diagrams (Frost, Section 4.5.1 and Appendix D).
  *
  * Both algorithms take the dataset size `n`, the ground-truth clustering
  * (cluster ID per record), the list of scored matches, and the number of
  * sample points `s`, and return `s` confusion matrices. Matrix `i`
  * corresponds to the similarity threshold that admits the top
  * `i * |Matches| / (s-1)` matches (matrix 0 admits none — threshold ∞).
  * Sampling by match *count* rather than by uniform threshold steps follows
  * the paper (Appendix D.1) and avoids empty diagram segments.
  *
  * The experiment at each threshold is the transitive closure of the
  * admitted matches, per Frost's requirement that experiments are
  * clusterings.
  */
object MetricDiagram {

  /** Boundary indices into the score-descending match list: sample point `i`
    * admits matches `[0, boundaries(i))`.
    */
  private[core] def boundaries(nMatches: Int, s: Int): Array[Int] = {
    require(s >= 2, s"need at least 2 sample points, got $s")
    Array.tabulate(s)(i => ((i.toLong * nMatches) / (s - 1)).toInt)
  }

  private def sortedDesc(matches: IndexedSeq[ScoredMatch]): IndexedSeq[ScoredMatch] =
    matches.sortBy(-_.score)

  /** The paper's optimized algorithm (Appendix D, Algorithm 1): a single
    * pass over the score-sorted matches through a tracked-union union-find,
    * maintaining the experiment∩ground-truth intersection clustering
    * dynamically. Worst-case O(n + |Matches| * (s + log|Matches|)).
    */
  def custom(n: Int, gold: Array[Int], matches: IndexedSeq[ScoredMatch], s: Int): IndexedSeq[ConfusionMatrix] = {
    require(gold.length == n, s"gold clustering covers ${gold.length} records, dataset has $n")
    val sorted = sortedDesc(matches)
    val bounds = boundaries(sorted.length, s)
    val exp = new UnionFind(n)
    val intersect = new DynamicIntersection(gold)
    val goldPairs = goldPairCount(gold)
    val total = ConfusionMatrix.pairsOf(n.toLong)

    val out = IndexedSeq.newBuilder[ConfusionMatrix]
    def snapshot(): ConfusionMatrix = {
      val tp = intersect.pairCount
      val fp = exp.pairCount - tp
      val fn = goldPairs - tp
      ConfusionMatrix(tp, fp, fn, total - tp - fp - fn)
    }
    out += snapshot()
    var i = 1
    while (i < s) {
      val batch = sorted.view.slice(bounds(i - 1), bounds(i)).map(m => (m.a, m.b))
      val merges = exp.trackedUnion(batch)
      intersect.update(merges)
      out += snapshot()
      i += 1
    }
    out.result()
  }

  /** The paper's naïve comparison algorithm: for every sample point, rebuild
    * the experiment clustering and the intersection from scratch (linear in
    * n + admitted matches), i.e. O(s * (n + |Matches|)) total. This is the
    * "slightly more advanced" clustering-based naïve of Appendix D, the one
    * benchmarked in Table 1 (the pair-materializing naïve is quadratic and
    * infeasible at 10^5+ records).
    */
  def naive(n: Int, gold: Array[Int], matches: IndexedSeq[ScoredMatch], s: Int): IndexedSeq[ConfusionMatrix] = {
    require(gold.length == n, s"gold clustering covers ${gold.length} records, dataset has $n")
    val sorted = sortedDesc(matches)
    val bounds = boundaries(sorted.length, s)
    (0 until s).map { i =>
      val uf = new UnionFind(n)
      var j = 0
      while (j < bounds(i)) { uf.union(sorted(j).a, sorted(j).b); j += 1 }
      ConfusionMatrix.fromClusterings(uf.toClustering, gold)
    }
  }

  /** Map a confusion-matrix sequence through two named metrics, producing
    * the diagram's (x, y) points (e.g. "recall" vs "precision" — Figure 3).
    */
  def diagram(matrices: Seq[ConfusionMatrix], xMetric: String, yMetric: String): Seq[(Double, Double)] = {
    val fx = PairMetrics.byName.getOrElse(xMetric, sys.error(s"unknown metric $xMetric"))
    val fy = PairMetrics.byName.getOrElse(yMetric, sys.error(s"unknown metric $yMetric"))
    matrices.map(m => (fx(m), fy(m)))
  }

  private def goldPairCount(gold: Array[Int]): Long = {
    val counts = new scala.collection.mutable.LongMap[Long]
    gold.foreach(c => counts(c.toLong) = counts.getOrElse(c.toLong, 0L) + 1)
    counts.values.map(ConfusionMatrix.pairsOf).sum
  }
}
