package repro.matching

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.ConnectedComponents

/** A matching solution: dataset → scored candidate pairs (Frost, Section
  * 1.2, steps 2–4). The pipeline is blocking → per-attribute similarity →
  * weighted decision score; `matches(threshold)` applies the decision and
  * `clustering` transitively closes the matches into an experiment.
  */
trait MatchingSolution {
  def name: String

  /** Scored candidate pairs: (a, b, score) with score in [0, 1]. */
  def score(records: DataFrame): DataFrame

  /** Pairs whose score passes the threshold. */
  def matches(records: DataFrame, threshold: Double): DataFrame =
    score(records).filter(col("score") >= threshold).select(col("a"), col("b"), col("score"))

  /** Experiment clustering (id, cluster): transitive closure of the matches. */
  def clustering(spark: SparkSession, records: DataFrame, threshold: Double): DataFrame = {
    val edges = matches(records, threshold).select(col("a").as("src"), col("b").as("dst"))
    ConnectedComponents.run(spark, records, edges)
  }
}

/** How one attribute contributes to a weighted rule score. */
final case class AttributeRule(attr: String, weight: Double, measure: String = "jaccard") {
  require(weight >= 0, s"negative weight for $attr")

  def simCol(l: Column, r: Column): Column = measure match {
    case "jaccard"     => Similarity.tokenJaccardCol(l, r)
    case "levenshtein" => Similarity.levenshteinSimCol(l, r)
    case "equality"    => Similarity.equalityCol(l, r)
    case other         => sys.error(s"unknown measure: $other")
  }
}

/** Rule-based matcher: weighted mean of per-attribute similarities over
  * token-blocked candidates. When both values of an attribute are null the
  * attribute is excluded from the weighted mean (it carries no signal);
  * a null on one side scores 0 — missing data hurts, which is exactly the
  * "material mismatch" mechanism of Frost Section 4.5.2.
  */
final case class WeightedRuleMatcher(
    name: String,
    rules: Seq[AttributeRule],
    blockingAttrs: Seq[String],
    maxBlockSize: Int = 50,
    knownVocab: Option[Set[String]] = None,
) extends MatchingSolution {
  require(rules.nonEmpty && rules.exists(_.weight > 0), "need at least one weighted rule")

  override def score(records: DataFrame): DataFrame = {
    val candidates = Blocking.tokenBlocking(records, blockingAttrs, maxBlockSize, knownVocab = knownVocab)
    val attrs = rules.map(_.attr).distinct
    val left  = records.select((col("id").as("a") +: attrs.map(c => col(c).as(s"la_$c"))).toSeq: _*)
    val right = records.select((col("id").as("b") +: attrs.map(c => col(c).as(s"rb_$c"))).toSeq: _*)
    val joined = candidates.join(left, Seq("a")).join(right, Seq("b"))

    // Weighted mean over attributes with signal: weight participates only
    // when at least one side is non-null.
    val jaccardKnown = knownVocab.map(Similarity.tokenJaccardKnownUdf)
    val contributions = rules.map { rule =>
      val l = col(s"la_${rule.attr}"); val r = col(s"rb_${rule.attr}")
      val active = l.isNotNull || r.isNotNull
      val rawSim = (rule.measure, jaccardKnown) match {
        case ("jaccard", Some(f)) => f(l, r) // vocabulary-restricted solution
        case _                    => rule.simCol(l, r)
      }
      val sim = when(l.isNull || r.isNull, lit(0.0)).otherwise(rawSim)
      (when(active, lit(rule.weight)).otherwise(lit(0.0)), sim)
    }
    val num = contributions.map { case (w, s) => w * s }.reduce(_ + _)
    val den = contributions.map(_._1).reduce(_ + _)
    joined
      .withColumn("score", when(den > 0, num / den).otherwise(lit(0.0)))
      .select(col("a"), col("b"), col("score"))
  }
}

/** Baseline matcher: plain token-Jaccard over the concatenation of the
  * given attributes — the robust "bag of tokens" approach.
  */
final case class TokenJaccardMatcher(
    name: String,
    attrs: Seq[String],
    blockingAttrs: Seq[String],
    maxBlockSize: Int = 50,
) extends MatchingSolution {

  override def score(records: DataFrame): DataFrame = {
    val candidates = Blocking.tokenBlocking(records, blockingAttrs, maxBlockSize)
    val concatCol = concat_ws(" ", attrs.map(a => coalesce(col(a).cast("string"), lit(""))): _*)
    val slim = records.select(col("id"), concatCol.as("blob"))
    val left  = slim.select(col("id").as("a"), col("blob").as("la"))
    val right = slim.select(col("id").as("b"), col("blob").as("rb"))
    candidates.join(left, Seq("a")).join(right, Seq("b"))
      .withColumn("score", Similarity.tokenJaccardCol(col("la"), col("rb")))
      .select(col("a"), col("b"), col("score"))
  }
}
