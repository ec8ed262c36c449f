package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ClusterMetricsSpec extends AnyFunSuite {

  private val gold = Array(0, 0, 0, 1, 1, 2)

  test("closest-cluster metrics are 1 for identical clusterings") {
    assert(ClusterMetrics.closestClusterPrecision(gold, gold) == 1.0)
    assert(ClusterMetrics.closestClusterRecall(gold, gold) == 1.0)
    assert(ClusterMetrics.closestClusterF1(gold, gold) == 1.0)
  }

  test("closest-cluster precision penalizes an over-merged experiment") {
    val exp = Array.fill(6)(0) // one big cluster
    // best Jaccard vs gold clusters: max(3/6, 2/6, 1/6) = 0.5, one cluster
    assert(ClusterMetrics.closestClusterPrecision(exp, gold) == 0.5)
    // recall: each gold cluster vs the big one: 3/6, 2/6, 1/6 → mean = 1/3
    assert(math.abs(ClusterMetrics.closestClusterRecall(exp, gold) - 1.0 / 3) < 1e-12)
  }

  test("closest-cluster f1 on all-singleton experiment") {
    val exp = Array(0, 1, 2, 3, 4, 5)
    // precision: each singleton vs best gold cluster: 1/3,1/3,1/3,1/2,1/2,1 → mean
    val p = (1.0 / 3 * 3 + 0.5 * 2 + 1.0) / 6
    assert(math.abs(ClusterMetrics.closestClusterPrecision(exp, gold) - p) < 1e-12)
    // recall: gold clusters vs singletons: 1/3, 1/2, 1 → mean
    val r = (1.0 / 3 + 0.5 + 1.0) / 3
    assert(math.abs(ClusterMetrics.closestClusterRecall(exp, gold) - r) < 1e-12)
  }

  test("variation of information is 0 for identical clusterings") {
    assert(math.abs(ClusterMetrics.variationOfInformation(gold, gold)) < 1e-12)
  }

  test("variation of information is 0 for relabelled clusterings") {
    val relabel = gold.map(_ + 100)
    assert(math.abs(ClusterMetrics.variationOfInformation(relabel, gold)) < 1e-12)
  }

  test("variation of information: two halves vs one cluster equals ln 2") {
    val a = Array(0, 0, 1, 1)
    val b = Array(0, 0, 0, 0)
    // VI = H(a) + H(b) - 2 I(a,b); H(a)=ln2, H(b)=0, I=0 → VI = ln2
    assert(math.abs(ClusterMetrics.variationOfInformation(a, b) - math.log(2)) < 1e-12)
  }

  test("variation of information is symmetric") {
    val a = Array(0, 0, 1, 2, 2, 2)
    val b = Array(0, 1, 1, 1, 2, 2)
    assert(math.abs(ClusterMetrics.variationOfInformation(a, b) -
      ClusterMetrics.variationOfInformation(b, a)) < 1e-12)
  }

  test("generalized merge distance is 0 for identical clusterings") {
    assert(ClusterMetrics.generalizedMergeDistance(gold, gold) == 0.0)
  }

  test("GMD unit costs: singletons → gold needs (size-1) merges per cluster") {
    val exp = Array(0, 1, 2, 3, 4, 5)
    // gold clusters sizes 3,2,1 → merges: 2 + 1 + 0 = 3
    assert(ClusterMetrics.generalizedMergeDistance(exp, gold) == 3.0)
  }

  test("GMD unit costs: one big cluster → gold needs splits then merges") {
    val exp = Array.fill(6)(0)
    // split the 6-cluster into 3 gold-pure parts: 2 splits; no merges needed
    assert(ClusterMetrics.generalizedMergeDistance(exp, gold) == 2.0)
  }

  test("GMD with size-dependent merge costs") {
    val exp = Array(0, 1, 2)
    val allOne = Array(9, 9, 9)
    // merges: (1,1) then (2,1) with fm = product of sizes: 1 + 2 = 3
    val gmd = ClusterMetrics.generalizedMergeDistance(exp, allOne, fm = (a, b) => (a * b).toDouble)
    assert(gmd == 3.0)
  }

  test("GMD rejects mismatched lengths") {
    assertThrows[IllegalArgumentException](
      ClusterMetrics.generalizedMergeDistance(Array(0), Array(0, 1)))
  }

  for (seed <- 1 to 5) {
    test(s"VI nonnegative and GMD nonnegative on random clusterings (seed=$seed)") {
      val rnd = new Random(seed)
      val n = 30
      val a = Array.fill(n)(rnd.nextInt(7))
      val b = Array.fill(n)(rnd.nextInt(7))
      assert(ClusterMetrics.variationOfInformation(a, b) >= -1e-12)
      assert(ClusterMetrics.generalizedMergeDistance(a, b) >= 0.0)
      val ccf = ClusterMetrics.closestClusterF1(a, b)
      assert(ccf >= 0.0 && ccf <= 1.0)
    }
  }
}
