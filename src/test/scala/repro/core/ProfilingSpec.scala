package repro.core

import repro.{Oracle, SparkSpec}

class ProfilingSpec extends SparkSpec {
  import spark.implicits._

  private val records = Seq(
    (0L, "alpha beta", "x"),
    (1L, null.asInstanceOf[String], "y z"),
    (2L, "gamma", null.asInstanceOf[String]),
    (3L, "delta epsilon zeta", "x"),
  ).toDF("id", "name", "tag")

  test("sparsity counts nulls over all attribute cells") {
    // 2 nulls out of 8 cells
    assert(Profiling.sparsity(records, Seq("name", "tag")) == 0.25)
  }

  test("sparsity of a dense dataset is 0") {
    val dense = Seq((0L, "a"), (1L, "b")).toDF("id", "v")
    assert(Profiling.sparsity(dense, Seq("v")) == 0.0)
  }

  test("textuality is the mean word count over non-null values") {
    // name: 2, 1, 3 words; tag: 1, 2, 1 words → mean of (2,1,3,1,2,1) = 10/6
    assert(math.abs(Profiling.textuality(records, Seq("name", "tag")) - 10.0 / 6) < 1e-9)
  }

  test("textuality of empty input is 0") {
    val empty = Seq.empty[(Long, String)].toDF("id", "v")
    assert(Profiling.textuality(empty, Seq("v")) == 0.0)
  }

  test("tupleCount") {
    assert(Profiling.tupleCount(records) == 4)
  }

  test("positiveRatio from a gold clustering") {
    val gold = Seq((0L, 0L), (1L, 0L), (2L, 1L), (3L, 2L)).toDF("id", "cluster")
    // 1 duplicate pair out of C(4,2)=6
    assert(math.abs(Profiling.positiveRatio(gold) - 1.0 / 6) < 1e-12)
  }

  test("vocabulary is lower-cased distinct whitespace tokens over the attributes") {
    val vocab = Profiling.vocabulary(records, Seq("name", "tag"))
      .as[String].collect().toSet
    assert(vocab == Set("alpha", "beta", "gamma", "delta", "epsilon", "zeta", "x", "y", "z"))
  }

  test("vocabularySimilarity is the Jaccard of vocabularies") {
    val d1 = Seq((0L, "a b c")).toDF("id", "v")
    val d2 = Seq((0L, "b c d")).toDF("id", "v")
    assert(math.abs(Profiling.vocabularySimilarity(d1, Seq("v"), d2, Seq("v")) - 0.5) < 1e-12)
  }

  test("vocabularySimilarity of identical datasets is 1") {
    val d = Seq((0L, "a b")).toDF("id", "v")
    assert(Profiling.vocabularySimilarity(d, Seq("v"), d, Seq("v")) == 1.0)
  }

  test("profile bundles all four dataset-level metrics") {
    val gold = Seq((0L, 0L), (1L, 0L), (2L, 1L), (3L, 2L)).toDF("id", "cluster")
    val p = Profiling.profile(records, gold, Seq("name", "tag"))
    assert(p.sparsity == 0.25)
    assert(p.tupleCount == 4)
    assert(math.abs(p.positiveRatio - 1.0 / 6) < 1e-12)
  }

  test("oracle: null counts per attribute match DuckDB") {
    val sparkSide = records.agg(
      org.apache.spark.sql.functions.sum(
        org.apache.spark.sql.functions.when($"name".isNull, 1).otherwise(0)).as("name_nulls"),
      org.apache.spark.sql.functions.sum(
        org.apache.spark.sql.functions.when($"tag".isNull, 1).otherwise(0)).as("tag_nulls"),
    )
    Oracle.assertEquivalent(
      sparkSide,
      """SELECT sum(CASE WHEN name IS NULL THEN 1 ELSE 0 END) AS name_nulls,
        |       sum(CASE WHEN tag IS NULL THEN 1 ELSE 0 END) AS tag_nulls
        |FROM recs""".stripMargin,
      "recs" -> records,
    )
  }

  test("oracle: distinct token vocabulary matches DuckDB string_split") {
    val d = Seq((0L, "A b c"), (1L, "b D")).toDF("id", "v")
    val sparkSide = Profiling.vocabulary(d, Seq("v")).withColumnRenamed("token", "tok")
    Oracle.assertEquivalent(
      sparkSide,
      "SELECT DISTINCT lower(unnest(string_split(v, ' '))) AS tok FROM d WHERE v IS NOT NULL",
      "d" -> d,
    )
  }
}
