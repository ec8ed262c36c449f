package repro.core

import repro.{Oracle, SparkSpec}

class ErrorAnalysisSpec extends SparkSpec {
  import spark.implicits._

  // --- Section 4.4: nearest correctly classified pair -----------------------

  private val sims = Map(
    (1L, 3L) -> 0.9, (2L, 4L) -> 0.8, // direct vs candidate A
    (1L, 4L) -> 0.2, (2L, 3L) -> 0.1, // cross vs candidate A
    (1L, 5L) -> 0.4, (2L, 6L) -> 0.4,
    (1L, 6L) -> 0.3, (2L, 5L) -> 0.3,
  ).withDefaultValue(0.0)
  private val simFn: (Long, Long) => Double = (x, y) => sims((x, y))

  test("pairDistanceScore: Euclidean norm of the direct vector") {
    val score = ErrorAnalysis.pairDistanceScore(simFn, (1L, 2L), (3L, 4L), q = 2.0)
    assert(math.abs(score - math.sqrt(0.9 * 0.9 + 0.8 * 0.8)) < 1e-12)
  }

  test("pairDistanceScore: Manhattan with q=1") {
    val score = ErrorAnalysis.pairDistanceScore(simFn, (1L, 2L), (3L, 4L), q = 1.0)
    assert(math.abs(score - (0.9 + 0.8)) < 1e-12)
  }

  test("pairDistanceScore takes the max of direct and cross") {
    val crossDominant: (Long, Long) => Double = {
      case (1L, 4L) => 0.9; case (2L, 3L) => 0.9
      case _ => 0.1
    }
    val score = ErrorAnalysis.pairDistanceScore(crossDominant, (1L, 2L), (3L, 4L), q = 2.0)
    assert(math.abs(score - math.sqrt(2 * 0.9 * 0.9)) < 1e-12)
  }

  test("pairDistanceScore validates q") {
    assertThrows[IllegalArgumentException](
      ErrorAnalysis.pairDistanceScore(simFn, (1L, 2L), (3L, 4L), q = 3.0))
  }

  test("nearestCorrectPair picks the highest-scoring candidate") {
    val got = ErrorAnalysis.nearestCorrectPair(simFn, (1L, 2L), Seq((3L, 4L), (5L, 6L)))
    assert(got.map(_._1).contains((3L, 4L)))
  }

  test("nearestCorrectPair on empty candidates is None") {
    assert(ErrorAnalysis.nearestCorrectPair(simFn, (1L, 2L), Seq.empty).isEmpty)
  }

  // --- Sections 4.5.2 / 4.5.3: nullRatio and equalRatio ----------------------

  private val records = Seq(
    (0L, "acme", null.asInstanceOf[String]),
    (1L, "acme", "red"),
    (2L, "zeta", "red"),
    (3L, null.asInstanceOf[String], "blue"),
  ).toDF("id", "brand", "color")

  // classified pairs: (0,1) incorrect, (1,2) correct, (2,3) incorrect
  private val classified = Seq(
    (0L, 1L, false), (1L, 2L, true), (2L, 3L, false),
  ).toDF("a", "b", "correct")

  test("nullRatio counts pairs with at least one null per attribute") {
    val got = ErrorAnalysis.nullRatio(classified, records, Seq("brand", "color"))
      .as[(String, Long, Long, Double)].collect().map(r => r._1 -> r).toMap
    // brand: pair (2,3) has a null → nullCount 1, incorrect → ratio 1
    assert(got("brand") == (("brand", 1L, 1L, 1.0)))
    // color: pair (0,1) has a null → nullCount 1, incorrect → ratio 1
    assert(got("color") == (("color", 1L, 1L, 1.0)))
  }

  test("nullRatio is 0 when null pairs are classified correctly") {
    val allCorrect = Seq((0L, 1L, true), (2L, 3L, true)).toDF("a", "b", "correct")
    val got = ErrorAnalysis.nullRatio(allCorrect, records, Seq("brand"))
      .as[(String, Long, Long, Double)].collect().head
    assert(got._4 == 0.0)
  }

  test("equalRatio counts pairs equal in the attribute") {
    val got = ErrorAnalysis.equalRatio(classified, records, Seq("brand", "color"))
      .as[(String, Long, Long, Double)].collect().map(r => r._1 -> r).toMap
    // brand equal: (0,1) acme/acme → equalCount 1, incorrect → ratio 1
    assert(got("brand") == (("brand", 1L, 1L, 1.0)))
    // color equal: (1,2) red/red → equalCount 1, correct → ratio 0
    assert(got("color") == (("color", 1L, 0L, 0.0)))
  }

  test("equalRatio never counts null = null as equal") {
    val recs = Seq((0L, null.asInstanceOf[String]), (1L, null.asInstanceOf[String])).toDF("id", "v")
    val cls = Seq((0L, 1L, false)).toDF("a", "b", "correct")
    val got = ErrorAnalysis.equalRatio(cls, recs, Seq("v"))
      .as[(String, Long, Long, Double)].collect().head
    assert(got._2 == 0L && got._4 == 0.0)
  }

  test("ratios with empty hit sets are 0, not NaN") {
    val recs = Seq((0L, "x"), (1L, "y")).toDF("id", "v")
    val cls = Seq((0L, 1L, false)).toDF("a", "b", "correct")
    val nr = ErrorAnalysis.nullRatio(cls, recs, Seq("v")).as[(String, Long, Long, Double)].collect().head
    assert(nr._2 == 0L && nr._4 == 0.0)
  }

  test("oracle: null-pair counting matches DuckDB") {
    val joined = classified
      .join(records.select($"id".as("a"), $"brand".as("la")), Seq("a"))
      .join(records.select($"id".as("b"), $"brand".as("rb")), Seq("b"))
    val sparkSide = joined
      .filter($"la".isNull || $"rb".isNull)
      .agg(org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)).as("nullpairs"))
    Oracle.assertEquivalent(
      sparkSide,
      """SELECT count(*) AS nullpairs
        |FROM cls c
        |JOIN recs l ON c.a = l.id
        |JOIN recs r ON c.b = r.id
        |WHERE l.brand IS NULL OR r.brand IS NULL""".stripMargin,
      "cls" -> classified,
      "recs" -> records,
    )
  }
}
