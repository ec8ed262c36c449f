package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class ClusteringOpsSpec extends SparkSpec {
  import spark.implicits._

  private def clustering(pairs: (Long, Long)*) = pairs.toDF("id", "cluster")

  test("canonicalPairs orders, dedups, and drops self-pairs") {
    val raw = Seq((2L, 1L), (1L, 2L), (3L, 3L), (4L, 5L)).toDF("a", "b")
    val got = ClusteringOps.canonicalPairs(raw).as[(Long, Long)].collect().toSet
    assert(got == Set((1L, 2L), (4L, 5L)))
  }

  test("pairsFromClustering enumerates intra-cluster pairs") {
    val c = clustering((0L, 10L), (1L, 10L), (2L, 10L), (3L, 20L), (4L, 20L), (5L, 30L))
    val got = ClusteringOps.pairsFromClustering(c).as[(Long, Long)].collect().toSet
    assert(got == Set((0L, 1L), (0L, 2L), (1L, 2L), (3L, 4L)))
  }

  test("pairCount computes sum of C(n,2)") {
    val c = clustering((0L, 10L), (1L, 10L), (2L, 10L), (3L, 20L), (4L, 20L), (5L, 30L))
    assert(ClusteringOps.pairCount(c) == 4L)
  }

  test("pairCount of all singletons is zero") {
    val c = clustering((0L, 0L), (1L, 1L), (2L, 2L))
    assert(ClusteringOps.pairCount(c) == 0L)
  }

  test("pairCount agrees with materialized pairsFromClustering on a bigger clustering") {
    val c = (0L until 200L).map(i => (i, i % 13)).toDF("id", "cluster")
    assert(ClusteringOps.pairCount(c) == ClusteringOps.pairsFromClustering(c).count())
  }

  test("intersection joins the two clusterings by record") {
    val exp = clustering((0L, 1L), (1L, 1L), (2L, 2L))
    val gold = clustering((0L, 7L), (1L, 8L), (2L, 7L))
    val got = ClusteringOps.intersection(exp, gold)
      .as[(Long, Long, Long)].collect().toSet
    assert(got == Set((0L, 1L, 7L), (1L, 1L, 8L), (2L, 2L, 7L)))
  }

  test("intersectionPairCount equals the TP of fromClusterings") {
    val expArr = Array(0, 0, 0, 1, 1, 2)
    val goldArr = Array(0, 0, 1, 1, 1, 2)
    val exp = expArr.zipWithIndex.map { case (c, i) => (i.toLong, c.toLong) }.toSeq.toDF("id", "cluster")
    val gold = goldArr.zipWithIndex.map { case (c, i) => (i.toLong, c.toLong) }.toSeq.toDF("id", "cluster")
    val cm = ConfusionMatrix.fromClusterings(expArr, goldArr)
    assert(ClusteringOps.intersectionPairCount(exp, gold) == cm.tp)
  }

  test("oracle: per-cluster counts match DuckDB") {
    val c = (0L until 50L).map(i => (i, i % 7)).toDF("id", "cluster")
    val sparkSide = c.groupBy($"cluster").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      sparkSide,
      "SELECT cluster, count(*) AS n FROM clust GROUP BY cluster",
      "clust" -> c,
    )
  }

  test("oracle: intra-cluster pair enumeration matches a DuckDB self-join") {
    val c = (0L until 30L).map(i => (i, i % 5)).toDF("id", "cluster")
    val sparkSide = ClusteringOps.pairsFromClustering(c)
    Oracle.assertEquivalent(
      sparkSide,
      """SELECT l.id AS a, r.id AS b
        |FROM clust l JOIN clust r
        |  ON l.cluster = r.cluster AND CAST(l.id AS BIGINT) < CAST(r.id AS BIGINT)""".stripMargin,
      "clust" -> c,
    )
  }

  test("oracle: pair count per cluster matches DuckDB arithmetic") {
    val c = (0L until 40L).map(i => (i, i % 6)).toDF("id", "cluster")
    val sparkSide = c.groupBy($"cluster")
      .agg((count(lit(1)) * (count(lit(1)) - 1) / 2).cast("long").as("pairs"))
    Oracle.assertEquivalent(
      sparkSide,
      "SELECT cluster, CAST(count(*) * (count(*) - 1) / 2 AS BIGINT) AS pairs FROM clust GROUP BY cluster",
      "clust" -> c,
    )
  }
}
