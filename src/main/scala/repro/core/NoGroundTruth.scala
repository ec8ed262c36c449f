package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.ConnectedComponents

/** Quality estimation without a ground truth (Frost, Section 3.2.3). */
object NoGroundTruth {

  /** Number of pairs missing to transitively close a match set: the pair
    * count of the closure minus the distinct proposed pairs. The larger,
    * the more inconsistent the proposed matches.
    */
  def missingClosurePairs(spark: SparkSession, records: DataFrame, matchPairs: DataFrame): Long = {
    val pairs = ClusteringOps.canonicalPairs(matchPairs).cache()
    val edges = pairs.select(col("a").as("src"), col("b").as("dst"))
    val clustering = ConnectedComponents.run(spark, records, edges)
    val closed = ClusteringOps.pairCount(clustering)
    val proposed = pairs.count()
    pairs.unpersist()
    closed - proposed
  }

  /** Consensus deviation (majority vote over several experiments): for every
    * pair proposed by at least one experiment, the majority vote is "match"
    * iff more than half of the experiments contain it; an experiment's
    * deviation is the number of its decisions differing from the majority.
    * Returns (experiment index, deviations).
    */
  def consensusDeviation(experiments: Seq[DataFrame]): Seq[(Int, Long)] = {
    require(experiments.size >= 2, "consensus needs at least two experiments")
    val regions = SetComparison.vennRegions(experiments).cache()
    val half = experiments.size / 2.0
    val votesExpr = experiments.indices
      .map(i => when(col("region").bitwiseAND(1L << i) =!= 0, 1).otherwise(0))
      .reduce(_ + _)
    val tallied = regions.withColumn("votes", votesExpr).withColumn("majority", votesExpr > half).cache()
    val out = experiments.indices.map { i =>
      val has = col("region").bitwiseAND(1L << i) =!= 0
      val dev = tallied.filter((has && !col("majority")) || (!has && col("majority"))).count()
      (i, dev)
    }
    regions.unpersist(); tallied.unpersist()
    out
  }

  /** Compactness of matched pairs and sparsity of close non-matches
    * (Chaudhuri et al.): mean score of matches vs mean score of the
    * highest-scoring non-matches. Higher compactness and lower neighbourhood
    * similarity suggest a better matching result.
    *
    * @param scored (a, b, score, matched: Boolean) — all scored candidate pairs
    */
  def compactnessAndSparsity(scored: DataFrame, neighbourhoodSize: Int = 1000): (Double, Double) = {
    val compact = scored.filter(col("matched"))
      .agg(avg(col("score")).as("m")).collect()(0)
    val compactness = Option(compact.getAs[Any]("m")).map(_.toString.toDouble).getOrElse(0.0)
    val sparse = scored.filter(!col("matched"))
      .orderBy(col("score").desc).limit(neighbourhoodSize)
      .agg(avg(col("score")).as("m")).collect()(0)
    val sparsity = Option(sparse.getAs[Any]("m")).map(_.toString.toDouble).getOrElse(0.0)
    (compactness, sparsity)
  }
}
