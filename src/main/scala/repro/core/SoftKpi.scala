package repro.core

/** Soft KPIs: effort, cost, and business factors (Frost, Section 3.3).
  *
  * Effort is modelled by two variables: HR-amount (hours an expert needs)
  * and expertise (skill level 0–100). Combining them with a pay-rate model
  * yields an estimated monetary cost. Categorical KPIs (deployment type,
  * interfaces, techniques) and lifecycle expenditures complete the decision
  * matrix; aggregation into use-case KPIs is user-defined, so this module
  * provides the framework (generic aggregation), not fixed strategies.
  */
object SoftKpi {

  /** An effort measurement: hours spent by a person of a given expertise. */
  final case class Effort(hrAmount: Double, expertise: Int) {
    require(hrAmount >= 0, s"negative HR-amount: $hrAmount")
    require(expertise >= 0 && expertise <= 100, s"expertise out of [0,100]: $expertise")

    /** Monetary cost under a pay-rate model mapping expertise → hourly rate. */
    def cost(rate: Int => Double): Double = hrAmount * rate(expertise)
  }

  /** Default linear pay-rate model: base rate plus a premium growing with
    * expertise (expertise is "typically related to pay level").
    */
  def linearRate(base: Double = 30.0, perPoint: Double = 1.2): Int => Double =
    expertise => base + perPoint * expertise

  /** Lifecycle expenditures (LCCA-based): per product phase. */
  final case class Lifecycle(
      generalCosts: Double,
      integrationEffort: Effort,
      domainConfigEffort: Effort,
      techniqueConfigEffort: Effort,
  ) {
    def totalCost(rate: Int => Double): Double =
      generalCosts +
        integrationEffort.cost(rate) +
        domainConfigEffort.cost(rate) +
        techniqueConfigEffort.cost(rate)
  }

  /** Categorical soft KPIs of a matching solution. */
  final case class Categorical(
      deploymentTypes: Set[String], // e.g. "on-premise", "cloud"
      interfaces: Set[String],      // e.g. "GUI", "API", "CLI"
      techniques: Set[String],      // e.g. "rule-based", "ml", "clustering"
  )

  /** Per-experiment soft KPIs. */
  final case class ExperimentKpis(setupEffort: Effort, runtimeSeconds: Double)

  /** One solution's row in the decision matrix: soft KPIs plus quality
    * metrics side by side ("a holistic view of the attractiveness").
    */
  final case class SolutionEntry(
      name: String,
      lifecycle: Lifecycle,
      categorical: Categorical,
      experiment: ExperimentKpis,
      quality: Map[String, Double],
  )

  /** Decision matrix: one row per solution, columns = metric name → value.
    * All lifecycle/experiment KPIs are flattened to comparable numbers.
    */
  def decisionMatrix(entries: Seq[SolutionEntry], rate: Int => Double = linearRate()): Seq[(String, Map[String, Double])] =
    entries.map { e =>
      val base = Map(
        "lifecycleCost"   -> e.lifecycle.totalCost(rate),
        "generalCosts"    -> e.lifecycle.generalCosts,
        "setupEffortH"    -> e.experiment.setupEffort.hrAmount,
        "setupCost"       -> e.experiment.setupEffort.cost(rate),
        "runtimeSeconds"  -> e.experiment.runtimeSeconds,
      )
      e.name -> (base ++ e.quality)
    }

  /** Generic KPI aggregation: weighted sum over selected columns of a
    * decision-matrix row (use-case specific — weights come from the user).
    */
  def aggregate(row: Map[String, Double], weights: Map[String, Double]): Double =
    weights.iterator.map { case (k, w) => w * row.getOrElse(k, 0.0) }.sum

  /** A point on an effort→metric curve (Figure 6): cumulative effort hours
    * and the best metric value achieved by then.
    */
  final case class EffortPoint(hours: Double, metric: Double)

  /** Effort curve: given raw (hours, metric) observations, produce the
    * monotone "maximum metric achieved by effort h" curve, sorted by hours.
    */
  def effortCurve(observations: Seq[(Double, Double)]): Seq[EffortPoint] = {
    val sorted = observations.sortBy(_._1)
    var best = Double.NegativeInfinity
    sorted.map { case (h, m) =>
      best = math.max(best, m)
      EffortPoint(h, best)
    }
  }

  /** Minimum effort needed to reach a metric threshold ("How much effort is
    * needed to reach 80% precision?") — None if never reached.
    */
  def effortToReach(observations: Seq[(Double, Double)], target: Double): Option[Double] =
    effortCurve(observations).find(_.metric >= target).map(_.hours)
}
