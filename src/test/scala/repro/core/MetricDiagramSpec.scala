package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

import repro.matching.ExperimentGen

class MetricDiagramSpec extends AnyFunSuite {

  test("boundaries split matches evenly") {
    assert(MetricDiagram.boundaries(10, 3).toSeq == Seq(0, 5, 10))
    assert(MetricDiagram.boundaries(9, 4).toSeq == Seq(0, 3, 6, 9))
    assert(MetricDiagram.boundaries(0, 2).toSeq == Seq(0, 0))
  }

  test("boundaries handle non-divisible counts monotonically, ending at |Matches|") {
    val b = MetricDiagram.boundaries(7, 4)
    assert(b.head == 0 && b.last == 7)
    assert(b.sliding(2).forall { case Array(x, y) => x <= y })
  }

  test("at least two sample points required") {
    assertThrows[IllegalArgumentException](MetricDiagram.boundaries(5, 1))
  }

  test("first matrix is the empty experiment (threshold infinity)") {
    val gold = Array(0, 0, 1, 1)
    val matches = IndexedSeq(ScoredMatch(0, 1, 0.9), ScoredMatch(2, 3, 0.8))
    val ms = MetricDiagram.custom(4, gold, matches, 3)
    assert(ms.head == ConfusionMatrix(0, 0, 2, 4))
  }

  test("paper Figure 10: full example through the custom algorithm") {
    // dataset {a,b,c,d}, gold g0:{a,b} g1:{c,d}, matches {a,c},{b,d},{a,b}
    // in descending score order, s = 4 → one matrix per merged pair.
    val gold = Array(0, 0, 1, 1)
    val matches = IndexedSeq(
      ScoredMatch(0, 2, 0.9), // {a,c}
      ScoredMatch(1, 3, 0.8), // {b,d}
      ScoredMatch(0, 1, 0.7), // {a,b}
    )
    val ms = MetricDiagram.custom(4, gold, matches, 4)
    assert(ms == IndexedSeq(
      ConfusionMatrix(0, 0, 2, 4),
      ConfusionMatrix(0, 1, 2, 3),
      ConfusionMatrix(0, 2, 2, 2),
      ConfusionMatrix(2, 4, 0, 0),
    ))
  }

  test("naive agrees with the paper Figure 10 example") {
    val gold = Array(0, 0, 1, 1)
    val matches = IndexedSeq(
      ScoredMatch(0, 2, 0.9), ScoredMatch(1, 3, 0.8), ScoredMatch(0, 1, 0.7))
    assert(MetricDiagram.naive(4, gold, matches, 4) ==
      MetricDiagram.custom(4, gold, matches, 4))
  }

  test("perfect experiment reaches f1 = 1 at the last sample point") {
    val gold = Array(0, 0, 0, 1, 1, 2)
    val matches = IndexedSeq(
      ScoredMatch(0, 1, 0.99), ScoredMatch(1, 2, 0.98), ScoredMatch(3, 4, 0.97))
    val ms = MetricDiagram.custom(6, gold, matches, 4)
    assert(PairMetrics.f1(ms.last) == 1.0)
  }

  test("recall is monotonically non-decreasing along sample points") {
    val gold = ExperimentGen.uniformGold(50, 10, 4)
    val matches = ExperimentGen.scoredExperiment(gold, 40, 0.2, seed = 5)
    val ms = MetricDiagram.custom(50, gold, matches, 9)
    val recalls = ms.map(PairMetrics.recall)
    assert(recalls.sliding(2).forall { case Seq(a, b) => b >= a - 1e-12 })
  }

  test("total pairs constant across the sweep") {
    val gold = ExperimentGen.uniformGold(30, 5, 3)
    val matches = ExperimentGen.scoredExperiment(gold, 20, 0.3, seed = 6)
    val ms = MetricDiagram.custom(30, gold, matches, 5)
    assert(ms.map(_.totalPairs).distinct == IndexedSeq(ConfusionMatrix.pairsOf(30)))
  }

  test("duplicate matches and already-merged pairs are harmless") {
    val gold = Array(0, 0, 0)
    val matches = IndexedSeq(
      ScoredMatch(0, 1, 0.9), ScoredMatch(1, 0, 0.8), ScoredMatch(0, 2, 0.7), ScoredMatch(1, 2, 0.6))
    val c = MetricDiagram.custom(3, gold, matches, 5)
    val n = MetricDiagram.naive(3, gold, matches, 5)
    assert(c == n)
    assert(c.last == ConfusionMatrix(3, 0, 0, 0))
  }

  test("empty match list still yields s identical matrices") {
    val gold = Array(0, 0, 1)
    val ms = MetricDiagram.custom(3, gold, IndexedSeq.empty, 3)
    assert(ms.size == 3)
    assert(ms.distinct.size == 1)
  }

  test("gold length must match n") {
    assertThrows[IllegalArgumentException](
      MetricDiagram.custom(5, Array(0, 1), IndexedSeq.empty, 2))
  }

  test("diagram maps matrices through named metrics") {
    val ms = Seq(ConfusionMatrix(0, 0, 2, 4), ConfusionMatrix(2, 0, 0, 4))
    val pts = MetricDiagram.diagram(ms, "recall", "precision")
    assert(pts == Seq((0.0, 0.0), (1.0, 1.0)))
  }

  test("diagram rejects unknown metric names") {
    assertThrows[RuntimeException](
      MetricDiagram.diagram(Seq(ConfusionMatrix(1, 1, 1, 1)), "nope", "precision"))
  }

  // The central equivalence property: custom (incremental, Appendix D) and
  // naive (rebuild per threshold) agree on every sample point, across random
  // golds, match lists, and sample counts.
  for (seed <- 1 to 12) {
    test(s"custom ≡ naive on random workloads (seed=$seed)") {
      val rnd = new Random(seed)
      val n = 20 + rnd.nextInt(60)
      val gold = Array.fill(n)(rnd.nextInt(1 + n / 4))
      val matches = IndexedSeq.fill(rnd.nextInt(80)) {
        val a = rnd.nextInt(n); var b = rnd.nextInt(n)
        if (a == b) b = (b + 1) % n
        ScoredMatch(a, b, rnd.nextDouble())
      }
      val s = 2 + rnd.nextInt(9)
      assert(MetricDiagram.custom(n, gold, matches, s) ==
        MetricDiagram.naive(n, gold, matches, s))
    }
  }
}
