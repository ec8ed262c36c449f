package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** DataFrame helpers for clusterings and pair sets.
  *
  * Conventions:
  *  - a *clustering* is a DataFrame (id: Long, cluster: Long);
  *  - a *pair set* is a DataFrame (a: Long, b: Long) with a < b
  *    (canonical unordered pairs).
  */
object ClusteringOps {

  /** Canonicalize an edge/pair DataFrame with columns `a`, `b` to a < b and
    * drop self-pairs and duplicates.
    */
  def canonicalPairs(pairs: DataFrame): DataFrame =
    pairs
      .select(least(col("a"), col("b")).as("a"), greatest(col("a"), col("b")).as("b"))
      .filter(col("a") < col("b"))
      .distinct()

  /** All intra-cluster pairs of a clustering — the pair-set view of an
    * experiment. Quadratic in cluster sizes; fine for Frost-scale clusters.
    */
  def pairsFromClustering(clustering: DataFrame): DataFrame = {
    val l = clustering.select(col("cluster"), col("id").as("a"))
    val r = clustering.select(col("cluster").as("cluster2"), col("id").as("b"))
    l.join(r, l("cluster") === r("cluster2") && col("a") < col("b"))
      .select(col("a"), col("b"))
  }

  /** Number of intra-cluster pairs, Σ_c C(|c|, 2), without materializing them. */
  def pairCount(clustering: DataFrame): Long =
    clustering
      .groupBy(col("cluster"))
      .agg(count(lit(1)).as("n"))
      .agg(sum(expr("n * (n - 1) / 2")).as("pairs"))
      .collect()(0)
      .getAs[Any]("pairs") match {
      case null          => 0L
      case l: Long       => l
      case d: java.math.BigDecimal => d.longValueExact()
      case x             => x.toString.toDouble.toLong
    }

  /** Intersection clustering of two clusterings over the same records:
    * (id, cluster = (expCluster, goldCluster) pair key). Returned as
    * (id: Long, ecluster: Long, gcluster: Long).
    */
  def intersection(exp: DataFrame, gold: DataFrame): DataFrame =
    exp.select(col("id"), col("cluster").as("ecluster"))
      .join(gold.select(col("id").as("gid"), col("cluster").as("gcluster")), col("id") === col("gid"))
      .select(col("id"), col("ecluster"), col("gcluster"))

  /** Intra-cluster pair count of the intersection clustering = TP. */
  def intersectionPairCount(exp: DataFrame, gold: DataFrame): Long =
    intersection(exp, gold)
      .groupBy(col("ecluster"), col("gcluster"))
      .agg(count(lit(1)).as("n"))
      .agg(sum(expr("n * (n - 1) / 2")).as("pairs"))
      .collect()(0)
      .getAs[Any]("pairs") match {
      case null          => 0L
      case l: Long       => l
      case d: java.math.BigDecimal => d.longValueExact()
      case x             => x.toString.toDouble.toLong
    }
}
