package repro.graph

import org.apache.spark.sql.functions._
import repro.SparkSpec

class ConnectedComponentsSpec extends SparkSpec {
  import spark.implicits._

  private def records(n: Int) = spark.range(n).toDF("id")

  private def edgesDf(pairs: (Long, Long)*) =
    pairs.toDF("src", "dst")

  private def clustersOf(df: org.apache.spark.sql.DataFrame): Map[Long, Long] =
    df.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap

  test("no edges → all singletons") {
    val c = clustersOf(ConnectedComponents.closure(records(4), edgesDf()))
    assert(c == Map(0L -> 0L, 1L -> 1L, 2L -> 2L, 3L -> 3L))
  }

  test("one edge merges two records") {
    val c = clustersOf(ConnectedComponents.closure(records(4), edgesDf((1L, 3L))))
    assert(c(1) == c(3))
    assert(c(0) != c(1) && c(2) != c(1))
  }

  test("transitive chain collapses to one component (min label)") {
    val c = clustersOf(ConnectedComponents.closure(records(6), edgesDf((0L, 1L), (1L, 2L), (2L, 3L))))
    assert(Set(c(0), c(1), c(2), c(3)).size == 1)
    assert(c(0) == 0L)
    assert(c(4) == 4L && c(5) == 5L)
  }

  test("edge direction and duplicates are irrelevant") {
    val a = clustersOf(ConnectedComponents.closure(records(4), edgesDf((2L, 0L), (0L, 2L), (2L, 0L))))
    assert(a(0) == a(2))
  }

  test("two separate components stay separate") {
    val c = clustersOf(ConnectedComponents.closure(records(6), edgesDf((0L, 1L), (3L, 4L))))
    assert(c(0) == c(1) && c(3) == c(4))
    assert(c(0) != c(3))
  }

  test("long path converges within maxIter (diameter test)") {
    val n = 40
    val edges = (1 until n).map(i => ((i - 1).toLong, i.toLong))
    val c = clustersOf(ConnectedComponents.closure(records(n), edgesDf(edges: _*)))
    assert(c.values.toSet.size == 1)
  }

  test("star graph converges in one round") {
    val edges = (1L to 10L).map(i => (0L, i))
    val c = clustersOf(ConnectedComponents.closure(records(11), edgesDf(edges: _*)))
    assert(c.values.toSet == Set(0L))
  }

  test("closure of a clique equals closure of its spanning tree") {
    val clique = for (i <- 0 until 4; j <- (i + 1) until 4) yield (i.toLong, j.toLong)
    val tree = Seq((0L, 1L), (1L, 2L), (2L, 3L))
    val a = clustersOf(ConnectedComponents.closure(records(5), edgesDf(clique: _*)))
    val b = clustersOf(ConnectedComponents.closure(records(5), edgesDf(tree: _*)))
    assert(a == b)
  }

  test("components() covers only matched nodes") {
    val c = ConnectedComponents.components(edgesDf((1L, 2L)))
    assert(c.select(col("id")).collect().map(_.getLong(0)).toSet == Set(1L, 2L))
  }

  test("matches driver-side union-find on a random graph") {
    val rnd = new scala.util.Random(7)
    val n = 100
    val pairs = Seq.fill(80)((rnd.nextInt(n).toLong, rnd.nextInt(n).toLong)).filter(p => p._1 != p._2)
    val uf = new repro.unionfind.UnionFind(n)
    pairs.foreach { case (a, b) => uf.union(a.toInt, b.toInt) }
    val spark_ = clustersOf(ConnectedComponents.closure(records(n), edgesDf(pairs: _*)))
    // same partition: records share a spark cluster iff they share a UF cluster
    for (i <- 0 until n; j <- (i + 1) until n) {
      assert((spark_(i) == spark_(j)) == uf.sameCluster(i, j), s"disagreement on ($i,$j)")
    }
  }
}
