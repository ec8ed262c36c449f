package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SoftKpiSpec extends AnyFunSuite {
  import SoftKpi._

  test("effort validates its ranges") {
    assertThrows[IllegalArgumentException](Effort(-1, 50))
    assertThrows[IllegalArgumentException](Effort(1, 101))
    assertThrows[IllegalArgumentException](Effort(1, -1))
  }

  test("cost combines HR-amount and expertise-dependent rate") {
    val rate = linearRate(base = 30, perPoint = 1.0)
    assert(Effort(10, 0).cost(rate) == 300.0)
    assert(Effort(10, 100).cost(rate) == 1300.0)
  }

  test("higher expertise costs more per hour under the default model") {
    val rate = linearRate()
    assert(rate(80) > rate(20))
  }

  test("lifecycle total cost adds general costs and all effort phases") {
    val lc = Lifecycle(
      generalCosts = 1000,
      integrationEffort = Effort(10, 50),
      domainConfigEffort = Effort(5, 80),
      techniqueConfigEffort = Effort(2, 90),
    )
    val rate: Int => Double = _ => 100.0 // flat rate for easy arithmetic
    assert(lc.totalCost(rate) == 1000 + 1700.0)
  }

  test("decision matrix flattens KPIs next to quality metrics") {
    val entry = SolutionEntry(
      name = "matcherA",
      lifecycle = Lifecycle(500, Effort(1, 50), Effort(1, 50), Effort(1, 50)),
      categorical = Categorical(Set("cloud"), Set("API"), Set("ml")),
      experiment = ExperimentKpis(Effort(2, 40), runtimeSeconds = 12.5),
      quality = Map("f1" -> 0.91, "precision" -> 0.95),
    )
    val matrix = decisionMatrix(Seq(entry), rate = _ => 10.0)
    val (name, row) = matrix.head
    assert(name == "matcherA")
    assert(row("lifecycleCost") == 500 + 30.0)
    assert(row("setupCost") == 20.0)
    assert(row("runtimeSeconds") == 12.5)
    assert(row("f1") == 0.91)
  }

  test("aggregate is a weighted sum with missing keys scored 0") {
    val row = Map("f1" -> 0.9, "cost" -> 100.0)
    assert(aggregate(row, Map("f1" -> 10.0, "cost" -> -0.01)) == 9.0 - 1.0)
    assert(aggregate(row, Map("missing" -> 5.0)) == 0.0)
  }

  test("effortCurve is monotone non-decreasing in the metric") {
    val obs = Seq((1.0, 0.5), (2.0, 0.4), (3.0, 0.7), (4.0, 0.65))
    val curve = effortCurve(obs)
    assert(curve.map(_.metric) == Seq(0.5, 0.5, 0.7, 0.7))
    assert(curve.map(_.hours) == Seq(1.0, 2.0, 3.0, 4.0))
  }

  test("effortCurve sorts by hours first") {
    val obs = Seq((3.0, 0.7), (1.0, 0.5))
    assert(effortCurve(obs).map(_.hours) == Seq(1.0, 3.0))
  }

  test("effortToReach finds the first crossing") {
    val obs = Seq((1.0, 0.5), (2.0, 0.6), (5.0, 0.85), (9.0, 0.9))
    assert(effortToReach(obs, 0.8).contains(5.0))
    assert(effortToReach(obs, 0.95).isEmpty)
    assert(effortToReach(obs, 0.5).contains(1.0))
  }

  test("breakthrough shape: asymptotic curve reaches a barrier (Figure 6 semantics)") {
    // Synthetic optimization sessions: rapid improvement then a plateau near
    // 14 hours — the effort diagram must expose both phases.
    val obs = (1 to 20).map(h => (h.toDouble, math.min(0.9, 0.2 + 0.06 * h)))
    val curve = effortCurve(obs)
    assert(curve.last.metric == 0.9)
    val plateauStart = curve.find(_.metric >= 0.9).get.hours
    assert(plateauStart <= 14.0)
    assert(curve.filter(_.hours >= plateauStart).forall(_.metric == 0.9))
  }
}
