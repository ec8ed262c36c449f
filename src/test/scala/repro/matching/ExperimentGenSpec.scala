package repro.matching

import org.scalatest.funsuite.AnyFunSuite

import repro.core.ConfusionMatrix

class ExperimentGenSpec extends AnyFunSuite {

  test("uniformGold builds the requested cluster structure") {
    val g = ExperimentGen.uniformGold(10, numClusters = 2, clusterSize = 3)
    assert(g.length == 10)
    assert(g.take(3).distinct.length == 1)
    assert(g.slice(3, 6).distinct.length == 1)
    assert(g(0) != g(3))
    // singletons all distinct
    assert(g.drop(6).distinct.length == 4)
  }

  test("uniformGold rejects oversized cluster demands") {
    assertThrows[IllegalArgumentException](ExperimentGen.uniformGold(5, 2, 3))
  }

  test("goldForPairBudget supplies at least the requested pairs") {
    val g = ExperimentGen.goldForPairBudget(1000, pairBudget = 100, clusterSize = 5)
    val pairs = ExperimentGen.goldPairs(g).size
    assert(pairs >= 100)
    assert(pairs <= 100 + ConfusionMatrix.pairsOf(5)) // at most one extra cluster's worth
  }

  test("goldPairs enumerates exactly the intra-cluster pairs") {
    val g = Array(0, 0, 0, 1, 1, 2)
    val pairs = ExperimentGen.goldPairs(g).toSet
    assert(pairs == Set((0, 1), (0, 2), (1, 2), (3, 4)))
  }

  test("scoredExperiment hits the exact match count") {
    val gold = ExperimentGen.uniformGold(200, 20, 4)
    val exp = ExperimentGen.scoredExperiment(gold, targetMatches = 100, fpRate = 0.2, seed = 1)
    assert(exp.size == 100)
  }

  test("scoredExperiment respects the fp rate split") {
    val gold = ExperimentGen.uniformGold(200, 20, 4)
    val exp = ExperimentGen.scoredExperiment(gold, 100, 0.25, seed = 2)
    val fps = exp.count(m => gold(m.a) != gold(m.b))
    assert(fps == 25)
  }

  test("scoredExperiment scores are in [0,1] and TPs skew higher than FPs") {
    val gold = ExperimentGen.uniformGold(500, 50, 4)
    val exp = ExperimentGen.scoredExperiment(gold, 200, 0.3, seed = 3)
    assert(exp.forall(m => m.score >= 0 && m.score <= 1))
    val (tps, fps) = exp.partition(m => gold(m.a) == gold(m.b))
    def mean(xs: Seq[Double]) = xs.sum / xs.size
    assert(mean(tps.map(_.score)) > mean(fps.map(_.score)))
  }

  test("scoredExperiment is deterministic in the seed") {
    val gold = ExperimentGen.uniformGold(100, 10, 4)
    val a = ExperimentGen.scoredExperiment(gold, 50, 0.1, seed = 42)
    val b = ExperimentGen.scoredExperiment(gold, 50, 0.1, seed = 42)
    assert(a == b)
    val c = ExperimentGen.scoredExperiment(gold, 50, 0.1, seed = 43)
    assert(a != c)
  }

  test("scoredExperiment false pairs are distinct and never self-pairs") {
    val gold = ExperimentGen.uniformGold(50, 5, 3)
    val exp = ExperimentGen.scoredExperiment(gold, 30, 0.5, seed = 4)
    val fps = exp.filter(m => gold(m.a) != gold(m.b)).map(m => (m.a, m.b))
    assert(fps.distinct.size == fps.size)
    assert(exp.forall(m => m.a != m.b))
  }

  test("scoredExperiment fails loudly when gold cannot supply enough true pairs") {
    val gold = ExperimentGen.uniformGold(10, 1, 2) // only one true pair
    assertThrows[IllegalArgumentException](
      ExperimentGen.scoredExperiment(gold, 100, 0.0, seed = 5))
  }
}
