package repro.unionfind

import scala.collection.mutable

/** Dynamically maintained intersection clustering of an evolving experiment
  * clustering and a fixed ground-truth clustering (Frost, Appendix D.3).
  *
  * Each intersection cluster is identified by an (experiment cluster,
  * ground-truth cluster) pair and holds the records they have in common.
  * The paper stores, for every experiment cluster, a map from involved
  * ground-truth cluster to the corresponding intersection cluster; we store
  * the same map but keep only the intersection cluster *size*, which is all
  * that is needed to maintain the intersection pair count (= true positives
  * of the confusion matrix). Merging is small-into-large, so a sequence of
  * m updates over n records costs O((n + m) log n) map moves.
  */
final class DynamicIntersection(goldOf: Array[Int]) {

  /** experiment representative -> (gold cluster -> intersection cluster size) */
  private val byExpCluster = mutable.LongMap.empty[mutable.LongMap[Long]]
  private var pairs        = 0L

  // Initial state: every record is its own experiment cluster; each
  // intersection cluster has size one.
  locally {
    var i = 0
    while (i < goldOf.length) {
      val m = mutable.LongMap.empty[Long]
      m(goldOf(i).toLong) = 1L
      byExpCluster(i.toLong) = m
      i += 1
    }
  }

  /** Number of intra-cluster pairs of the intersection clustering — equals
    * the TP count of the experiment against the ground truth.
    */
  def pairCount: Long = pairs

  /** Sizes of the intersection clusters of experiment cluster `expRoot`,
    * keyed by gold cluster ID (test/inspection hook).
    */
  def intersectionSizes(expRoot: Int): Map[Long, Long] =
    byExpCluster.get(expRoot.toLong).map(_.toMap).getOrElse(Map.empty)

  /** Apply a batch of experiment-cluster merges as reported by
    * [[UnionFind.trackedUnion]] (Algorithm 2 of the paper).
    */
  def update(merges: IterableOnce[Merge]): Unit = {
    val it = merges.iterator
    while (it.hasNext) {
      val Merge(target, sources) = it.next()
      // Gather the per-gold-cluster sizes of every source experiment cluster
      // and merge them small-into-large.
      var acc: mutable.LongMap[Long] = null
      sources.foreach { src =>
        val m = byExpCluster.remove(src.toLong).getOrElse(mutable.LongMap.empty[Long])
        if (acc == null) acc = m
        else {
          val (big, small) = if (acc.size >= m.size) (acc, m) else (m, acc)
          small.foreach { case (gold, cnt) =>
            val prev = big.getOrElse(gold, 0L)
            // Merging an intersection cluster of size `prev` with one of size
            // `cnt` (same gold, now same experiment cluster) adds prev*cnt pairs.
            pairs += prev * cnt
            big(gold) = prev + cnt
          }
          acc = big
        }
      }
      if (acc == null) acc = mutable.LongMap.empty[Long]
      byExpCluster(target.toLong) = acc
    }
  }
}
