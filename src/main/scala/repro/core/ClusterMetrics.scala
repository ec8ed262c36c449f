package repro.core

import scala.collection.mutable

/** Cluster-based quality metrics (Frost, Section 3.2.2). These compare the
  * experiment clustering and the ground-truth clustering directly, making
  * them immune to the true-negative class imbalance of pair-based metrics.
  *
  * Clusterings are given as cluster-ID-per-record arrays over the same
  * record indexing.
  */
object ClusterMetrics {

  private def clustersOf(assign: Array[Int]): Map[Int, Set[Int]] = {
    val m = mutable.HashMap.empty[Int, mutable.Set[Int]]
    var i = 0
    while (i < assign.length) {
      m.getOrElseUpdate(assign(i), mutable.Set.empty[Int]) += i
      i += 1
    }
    m.iterator.map { case (k, v) => k -> v.toSet }.toMap
  }

  private def jaccard(a: Set[Int], b: Set[Int]): Double = {
    val inter = a.intersect(b).size
    if (inter == 0) 0.0 else inter.toDouble / (a.size + b.size - inter)
  }

  /** Closest-cluster precision: mean over experiment clusters of the best
    * Jaccard similarity to any ground-truth cluster (Benjelloun et al. /
    * Menestrina et al.).
    */
  def closestClusterPrecision(exp: Array[Int], gold: Array[Int]): Double =
    meanBestJaccard(clustersOf(exp), clustersOf(gold))

  /** Closest-cluster recall: mean over ground-truth clusters of the best
    * Jaccard similarity to any experiment cluster.
    */
  def closestClusterRecall(exp: Array[Int], gold: Array[Int]): Double =
    meanBestJaccard(clustersOf(gold), clustersOf(exp))

  /** Closest-cluster f1 (harmonic mean of the above). */
  def closestClusterF1(exp: Array[Int], gold: Array[Int]): Double = {
    val p = closestClusterPrecision(exp, gold)
    val r = closestClusterRecall(exp, gold)
    if (p + r == 0) 0.0 else 2 * p * r / (p + r)
  }

  private def meanBestJaccard(from: Map[Int, Set[Int]], to: Map[Int, Set[Int]]): Double = {
    if (from.isEmpty) return 0.0
    // Only clusters sharing at least one record can have Jaccard > 0, so we
    // index `to` by record to avoid the quadratic cluster cross-product.
    val byRecord = mutable.HashMap.empty[Int, Set[Int]]
    to.values.foreach(c => c.foreach(r => byRecord(r) = c))
    val total = from.values.iterator.map { c =>
      c.iterator.flatMap(byRecord.get).distinct.map(jaccard(c, _)).maxOption.getOrElse(0.0)
    }.sum
    total / from.size
  }

  /** Variation of information (Meilă 2003): H(exp|gold) + H(gold|exp).
    * 0 iff the clusterings are identical; uses natural log.
    */
  def variationOfInformation(exp: Array[Int], gold: Array[Int]): Double = {
    require(exp.length == gold.length, "clusterings must cover the same records")
    val n = exp.length.toDouble
    if (n == 0) return 0.0
    val pe = mutable.LongMap.empty[Long]; val pg = mutable.LongMap.empty[Long]
    val joint = mutable.HashMap.empty[(Int, Int), Long]
    var i = 0
    while (i < exp.length) {
      pe(exp(i).toLong) = pe.getOrElse(exp(i).toLong, 0L) + 1
      pg(gold(i).toLong) = pg.getOrElse(gold(i).toLong, 0L) + 1
      val k = (exp(i), gold(i))
      joint(k) = joint.getOrElse(k, 0L) + 1
      i += 1
    }
    def h(counts: Iterator[Long]): Double =
      -counts.map(_ / n).filter(_ > 0).map(p => p * math.log(p)).sum
    val hE = h(pe.values.iterator)
    val hG = h(pg.values.iterator)
    val hJoint = h(joint.valuesIterator)
    // VI = 2*H(joint) - H(E) - H(G)
    2 * hJoint - hE - hG
  }

  /** Generalized merge distance (Menestrina, Whang, Garcia-Molina 2010) with
    * configurable merge/split costs `fm`/`fs`, each a function of the two
    * part sizes involved. With fm = fs = (_, _) => 1 this is the minimum
    * number of cluster merge/split operations to turn `exp` into `gold`.
    */
  def generalizedMergeDistance(
      exp: Array[Int],
      gold: Array[Int],
      fm: (Long, Long) => Double = (_, _) => 1.0,
      fs: (Long, Long) => Double = (_, _) => 1.0,
  ): Double = {
    require(exp.length == gold.length, "clusterings must cover the same records")
    // Slice algorithm: split every experiment cluster into its gold-pure
    // parts (split costs), then build each gold cluster by merging its parts
    // (merge costs). This ordering is cost-minimal for monotone cost models.
    var cost = 0.0
    // parts: per experiment cluster, sizes grouped by gold cluster
    val parts = mutable.HashMap.empty[Int, mutable.LongMap[Long]]
    var i = 0
    while (i < exp.length) {
      val m = parts.getOrElseUpdate(exp(i), mutable.LongMap.empty[Long])
      m(gold(i).toLong) = m.getOrElse(gold(i).toLong, 0L) + 1
      i += 1
    }
    parts.values.foreach { m =>
      if (m.size > 1) {
        // Sequentially split parts off the remainder.
        var remaining = m.values.sum
        m.values.toSeq.dropRight(1).foreach { part =>
          cost += fs(part, remaining - part)
          remaining -= part
        }
      }
    }
    // merges: per gold cluster, the pure parts contributed by experiment clusters
    val goldParts = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Long]]
    parts.foreach { case (_, m) =>
      m.foreach { case (g, cnt) =>
        goldParts.getOrElseUpdate(g.toInt, mutable.ArrayBuffer.empty[Long]) += cnt
      }
    }
    goldParts.values.foreach { sizes =>
      var acc = sizes.head
      sizes.tail.foreach { s => cost += fm(acc, s); acc += s }
    }
    cost
  }
}
