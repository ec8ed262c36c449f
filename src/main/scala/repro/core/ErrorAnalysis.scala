package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Error analysis (Frost, Sections 4.4, 4.5.2, 4.5.3): explain
  * misclassifications via similar correctly-classified pairs and via the
  * null/equality structure of attributes.
  */
object ErrorAnalysis {

  /** Distance score between a misclassified pair p_f and a correctly
    * classified candidate p_t (Section 4.4): build the direct and cross
    * record-similarity vectors, take each vector's Minkowski-q norm, and
    * score the candidate by the larger norm.
    *
    * @param sim record-to-record similarity in [0, 1]
    */
  def pairDistanceScore(
      sim: (Long, Long) => Double,
      pf: (Long, Long),
      pt: (Long, Long),
      q: Double = 2.0,
  ): Double = {
    require(q >= 1.0 && q <= 2.0, s"q must be in [1, 2], got $q")
    def norm(x: Double, y: Double): Double = math.pow(math.pow(x, q) + math.pow(y, q), 1.0 / q)
    val direct = norm(sim(pf._1, pt._1), sim(pf._2, pt._2))
    val cross  = norm(sim(pf._1, pt._2), sim(pf._2, pt._1))
    math.max(direct, cross)
  }

  /** The correctly classified pair most similar to a misclassified pair:
    * argmax of [[pairDistanceScore]] over the candidates.
    */
  def nearestCorrectPair(
      sim: (Long, Long) => Double,
      pf: (Long, Long),
      candidates: Seq[(Long, Long)],
      q: Double = 2.0,
  ): Option[((Long, Long), Double)] =
    candidates.map(pt => (pt, pairDistanceScore(sim, pf, pt, q))).maxByOption(_._2)

  /** nullRatio per attribute (Section 4.5.2).
    *
    * For every attribute a: nullCount(a) = pairs where at least one side is
    * null in a; falseNullCount(a) = misclassified pairs among them;
    * nullRatio(a) = falseNullCount / nullCount.
    *
    * @param pairs   classified pairs: (a, b, correct: Boolean)
    * @param records dataset with `id` + the attributes
    * @return (attribute, nullCount, falseNullCount, nullRatio)
    */
  def nullRatio(pairs: DataFrame, records: DataFrame, attrs: Seq[String]): DataFrame =
    attributeRatio(pairs, records, attrs, (l, r) => l.isNull || r.isNull,
      "nullCount", "falseNullCount", "nullRatio")

  /** equalRatio per attribute (Section 4.5.3): like nullRatio but over pairs
    * whose records are (non-null and) equal in the attribute.
    */
  def equalRatio(pairs: DataFrame, records: DataFrame, attrs: Seq[String]): DataFrame =
    attributeRatio(pairs, records, attrs,
      (l, r) => l.isNotNull && r.isNotNull && l === r,
      "equalCount", "falseEqualCount", "equalRatio")

  private def attributeRatio(
      pairs: DataFrame,
      records: DataFrame,
      attrs: Seq[String],
      pred: (org.apache.spark.sql.Column, org.apache.spark.sql.Column) => org.apache.spark.sql.Column,
      countName: String,
      falseName: String,
      ratioName: String,
  ): DataFrame = {
    val spark = pairs.sparkSession
    val left  = records.select((col("id").as("a") +: attrs.map(c => col(c).as(s"la_$c"))).toSeq: _*)
    val right = records.select((col("id").as("b") +: attrs.map(c => col(c).as(s"rb_$c"))).toSeq: _*)
    val joined = pairs.join(left, Seq("a")).join(right, Seq("b")).cache()
    val rows = attrs.map { a =>
      val hit = joined.filter(pred(col(s"la_$a"), col(s"rb_$a")))
      val agg = hit.agg(
        count(lit(1)).as("cnt"),
        sum(when(col("correct"), 0).otherwise(1)).as("falseCnt"),
      ).collect()(0)
      val cnt = agg.getAs[Long]("cnt")
      val falseCnt = Option(agg.getAs[Any]("falseCnt")).map(_.toString.toLong).getOrElse(0L)
      (a, cnt, falseCnt, if (cnt == 0) 0.0 else falseCnt.toDouble / cnt)
    }
    joined.unpersist()
    import spark.implicits._
    rows.toDF("attribute", countName, falseName, ratioName)
  }
}
