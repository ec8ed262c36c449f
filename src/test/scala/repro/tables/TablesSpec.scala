package repro.tables

import repro.SparkSpec
import repro.core.{MetricDiagram, PairMetrics, ScoredMatch}
import repro.matching.ExperimentGen

/** Unit-level checks of the table harnesses (the full-size runs live in the
  * bench project). Small workloads keep this fast.
  */
class TablesSpec extends SparkSpec {

  test("Table1 workloads carry the paper's record and match counts") {
    val byName = Table1.workloads.map(w => w.dataset -> w).toMap
    assert(byName("Altosight X4").records == 835 && byName("Altosight X4").matchedPairs == 4005)
    assert(byName("HPI Cora").records == 1879 && byName("HPI Cora").matchedPairs == 5067)
    assert(byName("FreeDB CDs").records == 9763 && byName("FreeDB CDs").matchedPairs == 147)
    assert(byName("Songs 100k").records == 100000 && byName("Songs 100k").matchedPairs == 45801)
    assert(byName("Magellan Songs").records == 1000000 && byName("Magellan Songs").matchedPairs == 144349)
  }

  test("Table1.build produces a feasible workload at each paper size") {
    Table1.workloads.take(3).foreach { w =>
      val (gold, matches) = Table1.build(w)
      assert(gold.length == w.records)
      assert(matches.size == w.matchedPairs)
    }
  }

  test("Table1.run validates custom against naive and reports positive timings") {
    val w = Table1.Workload("mini", 500, 300, 4, seed = 9)
    val r = Table1.run(w, reps = 1)
    assert(r.customMs > 0 && r.naiveMs > 0)
    assert(r.speedup > 0)
  }

  test("Table1.format renders one row per result") {
    val rows = Seq(Table1.Result("d", 10, 5, 1.0, 10.0))
    val out = Table1.format(rows)
    assert(out.linesIterator.size == 2)
    assert(out.contains("10.0x") || out.contains("10,0x"))
  }

  test("Table2 paper rows pin the published profile") {
    assert(Table2.paperRows.map(_.dataset) == Seq("X2", "Z2", "X3", "Z3"))
    assert(Table2.paperRows.map(_.tc) == Seq(58653L, 18915L, 56616L, 35778L))
  }

  test("Table3.tuneThreshold picks an f1-improving threshold") {
    val gold = ExperimentGen.uniformGold(200, 30, 3)
    val matches = ExperimentGen.scoredExperiment(gold, 120, 0.25, seed = 17).toArray
    val t = Table3.tuneThreshold(matches, 200, gold, samplePoints = 20)
    assert(t >= 0.0 && t <= 1.0)
    // the tuned threshold must beat both extremes
    def f1At(thr: Double): Double = {
      val admitted = matches.filter(_.score >= thr).toIndexedSeq
      val ms = MetricDiagram.custom(200, gold, admitted, 2)
      PairMetrics.f1(ms.last)
    }
    assert(f1At(t) >= f1At(0.99) - 1e-9)
    assert(f1At(t) >= f1At(0.0) - 1e-9)
  }

  test("Table3 solution families cover both weighting philosophies") {
    val x2 = Table3.solutions.filter(_.family == "X2")
    val x3 = Table3.solutions.filter(_.family == "X3")
    assert(x2.size == 3 && x3.size == 3)
    // X2 family weights the dense attributes over the name; X3 the reverse
    x2.foreach(s => assert(s.weights("description") > s.weights("name")))
    x3.foreach(s => assert(s.weights("name") > s.weights("description")))
  }

  test("Table3 familySims + scoreOf reproduce a WeightedRuleMatcher end-to-end") {
    import spark.implicits._
    val records = Seq(
      (0L, "alpha beta gamma", "fast cpu", "big ram", "hd screen", "long description here"),
      (1L, "alpha beta gamma", "fast cpu", "big ram", "hd screen", "long description here"),
      (2L, "delta epsilon", "slow cpu", null.asInstanceOf[String], "sd screen", "other text"),
    ).toDF("id", "name", "cpu", "ram", "screen", "description")
    val vocab = Set("alpha", "beta", "gamma", "delta", "epsilon", "fast", "slow", "cpu",
      "big", "ram", "hd", "sd", "screen", "long", "description", "here", "other", "text")
    val sims = Table3.familySims(records, vocab, maxBlockSize = 10)
    val sol = Table3.solutions.head
    val scored = sims.select($"a", $"b", Table3.scoreOf(sol).as("score"))
      .as[(Long, Long, Double)].collect().map(_._3)
    // matcher equivalent
    val m = repro.matching.WeightedRuleMatcher(
      "ref",
      Table3.attrs.map(a => repro.matching.AttributeRule(a, sol.weights(a))),
      Seq("name"), maxBlockSize = 10, knownVocab = Some(vocab))
    val ref = m.score(records).as[(Long, Long, Double)].collect().map(_._3)
    assert(scored.toSeq.sorted.zip(ref.toSeq.sorted).forall { case (x, y) => math.abs(x - y) < 1e-9 })
  }

  test("Table3 paper cells cover all 8 family × dataset combinations") {
    assert(Table3.paper.keySet ==
      (for (f <- Set("X2", "X3"); d <- Set("X2", "Z2", "X3", "Z3")) yield (f, d)))
  }
}
