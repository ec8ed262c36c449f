package repro.emdata

import org.scalatest.funsuite.AnyFunSuite

class VocabSpec extends AnyFunSuite {

  test("token is deterministic and prefix-tagged") {
    assert(Vocab.token("dom", 7) == "dom00007")
    assert(Vocab.token("dom", 7) == Vocab.token("dom", 7))
  }

  test("pool pair sizes add up") {
    val pp = Vocab.PoolPair(globalSize = 10, commonSize = 5, exclusiveSize = 3, pairTag = "t")
    assert(pp.train.size == 18)
    assert(pp.test.size == 18)
  }

  test("train and test share exactly global + common tokens") {
    val pp = Vocab.PoolPair(10, 5, 3, "t")
    val shared = pp.train.toSet.intersect(pp.test.toSet)
    assert(shared == (pp.globalTokens ++ pp.commonTokens).toSet)
    assert(pp.trainExclusive.toSet.intersect(pp.test.toSet).isEmpty)
  }

  test("designVs matches the Jaccard of the pools") {
    val pp = Vocab.PoolPair(10, 5, 3, "t")
    val inter = pp.train.toSet.intersect(pp.test.toSet).size.toDouble
    val union = pp.train.toSet.union(pp.test.toSet).size.toDouble
    assert(math.abs(pp.designVs - inter / union) < 1e-12)
  }

  test("forSimilarity hits the target VS up to rounding") {
    val pp = Vocab.forSimilarity(vs = 0.59, unionSize = 10000, globalSize = 3000, pairTag = "a")
    assert(math.abs(pp.designVs - 0.59) < 0.001)
    val pp2 = Vocab.forSimilarity(vs = 0.377, unionSize = 10000, globalSize = 3000, pairTag = "b")
    assert(math.abs(pp2.designVs - 0.377) < 0.001)
  }

  test("forSimilarity rejects an oversized global core") {
    assertThrows[IllegalArgumentException](
      Vocab.forSimilarity(vs = 0.1, unionSize = 1000, globalSize = 500, pairTag = "c"))
  }

  test("different pair tags produce disjoint non-global tokens") {
    val a = Vocab.forSimilarity(0.5, 1000, 200, "p1")
    val b = Vocab.forSimilarity(0.5, 1000, 200, "p2")
    val aSpecific = a.train.toSet -- a.globalTokens
    val bSpecific = b.train.toSet -- b.globalTokens
    assert(aSpecific.intersect(bSpecific).isEmpty)
  }

  test("DatasetSpecs X3 pool borrows from D2 commons without touching VS(X3,Z3)") {
    val x3 = DatasetSpecs.x3.pool.toSet
    val z3 = DatasetSpecs.z3.pool.toSet
    val inter = x3.intersect(z3).size.toDouble
    val union = x3.union(z3).size.toDouble
    assert(math.abs(inter / union - 0.377) < 0.005)
    // and the asymmetry holds: X3 shares more with X2 than Z3 does
    val x2 = DatasetSpecs.x2.pool.toSet
    assert(x3.intersect(x2).size > z3.intersect(x2).size)
  }
}
