package repro.core

/** Pair-based quality metrics computable from a [[ConfusionMatrix]]
  * (Frost, Section 3.2.1).
  *
  * Conventions: every metric returns a Double; metrics whose denominator is
  * zero return 0.0 (e.g. precision of an empty experiment) so sweeps over
  * thresholds never produce NaN points. MCC returns 0.0 when any marginal
  * is empty (the standard convention).
  */
object PairMetrics {

  def precision(m: ConfusionMatrix): Double =
    ratio(m.tp, m.tp + m.fp)

  def recall(m: ConfusionMatrix): Double =
    ratio(m.tp, m.tp + m.fn)

  /** Specificity / true-negative rate (used by ROC curves). */
  def specificity(m: ConfusionMatrix): Double =
    ratio(m.tn, m.tn + m.fp)

  def accuracy(m: ConfusionMatrix): Double =
    ratio(m.tp + m.tn, m.totalPairs)

  def f1(m: ConfusionMatrix): Double = {
    val p = precision(m); val r = recall(m)
    if (p + r == 0) 0.0 else 2 * p * r / (p + r)
  }

  /** F-star (Hand, Christen, Kirielle 2021): TP / (TP + FP + FN). */
  def fStar(m: ConfusionMatrix): Double =
    ratio(m.tp, m.tp + m.fp + m.fn)

  /** Fowlkes–Mallows index: sqrt(precision * recall). */
  def fowlkesMallows(m: ConfusionMatrix): Double =
    math.sqrt(precision(m) * recall(m))

  /** Matthews correlation coefficient. */
  def matthews(m: ConfusionMatrix): Double = {
    val tp = m.tp.toDouble; val fp = m.fp.toDouble
    val fn = m.fn.toDouble; val tn = m.tn.toDouble
    val denom = math.sqrt((tp + fp) * (tp + fn) * (tn + fp) * (tn + fn))
    if (denom == 0) 0.0 else (tp * tn - fp * fn) / denom
  }

  /** Reduction ratio (Köpcke & Rahm 2010): fraction of all pairs NOT
    * proposed by the candidate set / experiment, 1 - (TP+FP)/|[D]²|.
    */
  def reductionRatio(m: ConfusionMatrix): Double =
    1.0 - ratio(m.predictedPositive, m.totalPairs)

  /** Registry of named metrics, used by diagrams and decision matrices. */
  val byName: Map[String, ConfusionMatrix => Double] = Map(
    "precision"      -> precision,
    "recall"         -> recall,
    "specificity"    -> specificity,
    "accuracy"       -> accuracy,
    "f1"             -> f1,
    "fstar"          -> fStar,
    "fowlkesMallows" -> fowlkesMallows,
    "mcc"            -> matthews,
    "reductionRatio" -> reductionRatio,
  )

  private def ratio(num: Long, den: Long): Double =
    if (den == 0) 0.0 else num.toDouble / den.toDouble
}
