package repro.unionfind

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class DynamicIntersectionSpec extends AnyFunSuite {

  /** Brute-force TP: pairs agreeing in both exp and gold cluster. */
  private def bruteTp(exp: Array[Int], gold: Array[Int]): Long = {
    var tp = 0L
    for (i <- exp.indices; j <- (i + 1) until exp.length)
      if (exp(i) == exp(j) && gold(i) == gold(j)) tp += 1
    tp
  }

  test("initial intersection has zero pairs") {
    val di = new DynamicIntersection(Array(0, 0, 1, 1))
    assert(di.pairCount == 0)
  }

  test("initial per-cluster sizes are singletons keyed by gold cluster") {
    val di = new DynamicIntersection(Array(0, 0, 1))
    assert(di.intersectionSizes(0) == Map(0L -> 1L))
    assert(di.intersectionSizes(2) == Map(1L -> 1L))
  }

  test("merging two records of the same gold cluster yields one TP") {
    val gold = Array(0, 0, 1, 1)
    val uf = new UnionFind(4)
    val di = new DynamicIntersection(gold)
    di.update(uf.trackedUnion(Seq((0, 1))))
    assert(di.pairCount == 1)
  }

  test("merging two records of different gold clusters yields no TP") {
    val gold = Array(0, 0, 1, 1)
    val uf = new UnionFind(4)
    val di = new DynamicIntersection(gold)
    di.update(uf.trackedUnion(Seq((0, 2))))
    assert(di.pairCount == 0)
  }

  test("paper Figure 9: deferred side effect across merges") {
    // gold clustering {a,b},{c}; matches {b,c} then {a,c}. After the first
    // merge the intersection is unchanged; after the second, {a,b} appears.
    val gold = Array(0, 0, 1) // a=0, b=1, c=2
    val uf = new UnionFind(3)
    val di = new DynamicIntersection(gold)
    di.update(uf.trackedUnion(Seq((1, 2))))
    assert(di.pairCount == 0)
    di.update(uf.trackedUnion(Seq((0, 2))))
    assert(di.pairCount == 1) // the {a,b} intersection cluster
  }

  test("paper Figure 10 worked example, step by step") {
    // dataset {a,b,c,d} = 0..3; gold g0:{a,b}, g1:{c,d};
    // matches {a,c}, {b,d}, {a,b} applied one at a time.
    val gold = Array(0, 0, 1, 1)
    val uf = new UnionFind(4)
    val di = new DynamicIntersection(gold)
    assert(di.pairCount == 0) // step 0: TP 0

    di.update(uf.trackedUnion(Seq((0, 2)))) // step 1: {a,c}
    assert(di.pairCount == 0)               // TP 0 (FP 1)
    assert(uf.pairCount == 1)
    // intersection clusters of the merged cluster: g0:{a}, g1:{c}
    assert(di.intersectionSizes(uf.find(0)) == Map(0L -> 1L, 1L -> 1L))

    di.update(uf.trackedUnion(Seq((1, 3)))) // step 2: {b,d}
    assert(di.pairCount == 0)               // TP 0 (FP 2)
    assert(uf.pairCount == 2)

    di.update(uf.trackedUnion(Seq((0, 1)))) // step 3: {a,b}
    assert(di.pairCount == 2)               // TP 2: {a,b} and {c,d}
    assert(uf.pairCount == 6)               // FP 4
    assert(di.intersectionSizes(uf.find(0)) == Map(0L -> 2L, 1L -> 2L))
  }

  test("merging within one gold cluster accumulates C(k,2) TPs") {
    val gold = Array.fill(6)(0)
    val uf = new UnionFind(6)
    val di = new DynamicIntersection(gold)
    di.update(uf.trackedUnion((1 until 6).map(i => (i - 1, i))))
    assert(di.pairCount == 15)
  }

  test("batched update equals sequence of single updates") {
    val gold = Array(0, 0, 0, 1, 1, 2)
    val pairs = Seq((0, 1), (3, 4), (1, 3), (2, 5))
    val ufA = new UnionFind(6); val diA = new DynamicIntersection(gold)
    diA.update(ufA.trackedUnion(pairs))
    val ufB = new UnionFind(6); val diB = new DynamicIntersection(gold)
    pairs.foreach(p => diB.update(ufB.trackedUnion(Seq(p))))
    assert(diA.pairCount == diB.pairCount)
  }

  for (seed <- 1 to 10) {
    test(s"randomized TP tracking matches brute force (seed=$seed)") {
      val rnd = new Random(seed)
      val n = 40
      val gold = Array.fill(n)(rnd.nextInt(8))
      val uf = new UnionFind(n)
      val di = new DynamicIntersection(gold)
      (1 to 5).foreach { _ =>
        val batch = Seq.fill(1 + rnd.nextInt(10))((rnd.nextInt(n), rnd.nextInt(n)))
          .filter { case (a, b) => a != b }
        di.update(uf.trackedUnion(batch))
        assert(di.pairCount == bruteTp(uf.toClustering, gold))
      }
    }
  }
}
