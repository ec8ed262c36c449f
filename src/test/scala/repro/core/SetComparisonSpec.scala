package repro.core

import repro.{Oracle, SparkSpec}

class SetComparisonSpec extends SparkSpec {
  import spark.implicits._

  private val e1 = Seq((0L, 1L), (2L, 3L), (4L, 5L)).toDF("a", "b") // experiment 0
  private val e2 = Seq((0L, 1L), (2L, 3L), (6L, 7L)).toDF("a", "b") // experiment 1
  private val e3 = Seq((0L, 1L), (8L, 9L)).toDF("a", "b")           // experiment 2

  private def pairSet(df: org.apache.spark.sql.DataFrame): Set[(Long, Long)] =
    df.select("a", "b").as[(Long, Long)].collect().toSet

  test("vennRegions assigns the right bitmask to each pair") {
    val regions = SetComparison.vennRegions(Seq(e1, e2, e3))
      .as[(Long, Long, Long)].collect().map { case (a, b, r) => (a, b) -> r }.toMap
    assert(regions((0L, 1L)) == 7L) // in all three
    assert(regions((2L, 3L)) == 3L) // in e1 and e2
    assert(regions((4L, 5L)) == 1L) // only e1
    assert(regions((6L, 7L)) == 2L) // only e2
    assert(regions((8L, 9L)) == 4L) // only e3
  }

  test("select: intersection of all = experimental ground truth") {
    assert(pairSet(SetComparison.experimentalGroundTruth(Seq(e1, e2, e3))) == Set((0L, 1L)))
  }

  test("select: pairs only the new solution found (Section 4.1 use case)") {
    // pairs only e3 detected, compared against proven solutions e1, e2
    val onlyNew = SetComparison.select(Seq(e1, e2, e3), include = Set(2), exclude = Set(0, 1))
    assert(pairSet(onlyNew) == Set((8L, 9L)))
  }

  test("confusion partitions via set operations") {
    assert(pairSet(SetComparison.truePositives(e1, e2)) == Set((0L, 1L), (2L, 3L)))
    assert(pairSet(SetComparison.falsePositives(e1, e2)) == Set((4L, 5L)))
    assert(pairSet(SetComparison.falseNegatives(e1, e2)) == Set((6L, 7L)))
  }

  test("select validates its arguments") {
    assertThrows[IllegalArgumentException](SetComparison.select(Seq(e1), Set.empty, Set.empty))
    assertThrows[IllegalArgumentException](SetComparison.select(Seq(e1, e2), Set(0), Set(0)))
  }

  test("vennRegions canonicalizes unordered pairs before matching") {
    val flipped = Seq((1L, 0L)).toDF("a", "b")
    val regions = SetComparison.vennRegions(Seq(e1, flipped))
      .as[(Long, Long, Long)].collect().map { case (a, b, r) => (a, b) -> r }.toMap
    assert(regions((0L, 1L)) == 3L)
  }

  test("regionCounts sums pairs per region") {
    val counts = SetComparison.regionCounts(Seq(e1, e2))
      .as[(Long, Long)].collect().toMap
    assert(counts == Map(3L -> 2L, 1L -> 1L, 2L -> 1L))
  }

  test("enrich joins both records' attributes onto pairs") {
    val records = Seq((0L, "alpha"), (1L, "beta"), (2L, "gamma"), (3L, "delta"))
      .toDF("id", "name")
    val enriched = SetComparison.enrich(Seq((0L, 1L), (2L, 3L)).toDF("a", "b"), records)
    val rows = enriched.select("a", "b", "a_name", "b_name")
      .as[(Long, Long, String, String)].collect().toSet
    assert(rows == Set((0L, 1L, "alpha", "beta"), (2L, 3L, "gamma", "delta")))
  }

  test("oracle: two-set Venn region counts match DuckDB") {
    val sparkSide = SetComparison.regionCounts(Seq(e1, e2))
    Oracle.assertEquivalent(
      sparkSide,
      """SELECT CASE WHEN e2.a IS NULL THEN 1
        |            WHEN e1.a IS NULL THEN 2
        |            ELSE 3 END AS region,
        |       count(*) AS pairs
        |FROM e1 FULL OUTER JOIN e2 ON e1.a = e2.a AND e1.b = e2.b
        |GROUP BY 1""".stripMargin,
      "e1" -> e1,
      "e2" -> e2,
    )
  }

  test("oracle: difference (FP partition) matches DuckDB EXCEPT") {
    val sparkSide = SetComparison.falsePositives(e1, e2)
    Oracle.assertEquivalent(
      sparkSide,
      "SELECT a, b FROM e1 EXCEPT SELECT a, b FROM e2",
      "e1" -> e1,
      "e2" -> e2,
    )
  }
}
