package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PairMetricsSpec extends AnyFunSuite {
  private val m = ConfusionMatrix(tp = 6, fp = 2, fn = 4, tn = 88)

  test("precision") { assert(PairMetrics.precision(m) == 6.0 / 8) }
  test("recall") { assert(PairMetrics.recall(m) == 6.0 / 10) }
  test("specificity") { assert(PairMetrics.specificity(m) == 88.0 / 90) }
  test("accuracy") { assert(PairMetrics.accuracy(m) == 94.0 / 100) }

  test("f1 is the harmonic mean of precision and recall") {
    val p = 0.75; val r = 0.6
    assert(math.abs(PairMetrics.f1(m) - 2 * p * r / (p + r)) < 1e-12)
  }

  test("fStar equals TP / (TP + FP + FN)") {
    assert(PairMetrics.fStar(m) == 6.0 / 12)
  }

  test("fStar relates to f1 via f* = f1 / (2 - f1)") {
    val f1 = PairMetrics.f1(m)
    assert(math.abs(PairMetrics.fStar(m) - f1 / (2 - f1)) < 1e-12)
  }

  test("fowlkesMallows is sqrt(precision * recall)") {
    assert(math.abs(PairMetrics.fowlkesMallows(m) - math.sqrt(0.75 * 0.6)) < 1e-12)
  }

  test("matthews on a known matrix") {
    val tp = 6.0; val fp = 2.0; val fn = 4.0; val tn = 88.0
    val expected = (tp * tn - fp * fn) / math.sqrt((tp + fp) * (tp + fn) * (tn + fp) * (tn + fn))
    assert(math.abs(PairMetrics.matthews(m) - expected) < 1e-12)
  }

  test("reductionRatio is 1 - candidates/total") {
    assert(PairMetrics.reductionRatio(m) == 1.0 - 8.0 / 100)
  }

  test("empty experiment: precision 0, recall 0, f1 0 — no NaN") {
    val e = ConfusionMatrix(0, 0, 5, 95)
    assert(PairMetrics.precision(e) == 0.0)
    assert(PairMetrics.recall(e) == 0.0)
    assert(PairMetrics.f1(e) == 0.0)
    assert(PairMetrics.matthews(e) == 0.0)
  }

  test("perfect experiment: everything 1 (mcc included)") {
    val p = ConfusionMatrix(10, 0, 0, 90)
    assert(PairMetrics.precision(p) == 1.0)
    assert(PairMetrics.recall(p) == 1.0)
    assert(PairMetrics.f1(p) == 1.0)
    assert(PairMetrics.fStar(p) == 1.0)
    assert(PairMetrics.fowlkesMallows(p) == 1.0)
    assert(math.abs(PairMetrics.matthews(p) - 1.0) < 1e-12)
  }

  test("class imbalance: accuracy near 1 even when nothing is found (paper 3.2.1)") {
    val e = ConfusionMatrix(0, 0, 100, 999900)
    assert(PairMetrics.accuracy(e) > 0.999)
    assert(PairMetrics.f1(e) == 0.0) // f1 correctly reports failure
  }

  test("byName registry covers all metrics and evaluates") {
    assert(PairMetrics.byName.size == 9)
    PairMetrics.byName.values.foreach(f => assert(!f(m).isNaN))
  }

  for (seed <- 1 to 6) {
    test(s"all metrics stay in range on random matrices (seed=$seed)") {
      val rnd = new Random(seed)
      val mm = ConfusionMatrix(rnd.nextInt(100), rnd.nextInt(100), rnd.nextInt(100), rnd.nextInt(1000))
      Seq("precision", "recall", "specificity", "accuracy", "f1", "fstar", "fowlkesMallows", "reductionRatio")
        .foreach { name =>
          val v = PairMetrics.byName(name)(mm)
          assert(v >= 0.0 && v <= 1.0, s"$name=$v out of [0,1] for $mm")
        }
      val mcc = PairMetrics.matthews(mm)
      assert(mcc >= -1.0 && mcc <= 1.0)
    }
  }
}
