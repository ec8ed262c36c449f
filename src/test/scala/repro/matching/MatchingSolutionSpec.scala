package repro.matching

import repro.SparkSpec
import repro.core.MetricsEngine

class MatchingSolutionSpec extends SparkSpec {
  import spark.implicits._

  // Two duplicate clusters with corrupted copies plus distinct records.
  private val records = Seq(
    (0L, "thinkpad x230 carbon", "intel i5500 chip"),
    (1L, "thinkpad x230 carbon edition", "intel i5500 chip"),
    (2L, "macbook pro retina", "apple m1000 chip"),
    (3L, "macbook pro retina display", "apple m1000"),
    (4L, "chromebook spin", "mediatek octa"),
    (5L, "zenbook flip", null.asInstanceOf[String]),
  ).toDF("id", "name", "cpu")

  private val jaccardMatcher = TokenJaccardMatcher("tj", Seq("name", "cpu"), Seq("name", "cpu"))

  private val ruleMatcher = WeightedRuleMatcher(
    "wr",
    Seq(AttributeRule("name", 2.0, "jaccard"), AttributeRule("cpu", 1.0, "jaccard")),
    blockingAttrs = Seq("name", "cpu"),
  )

  test("token jaccard matcher scores duplicates above non-duplicates") {
    val scored = jaccardMatcher.score(records).as[(Long, Long, Double)].collect()
      .map { case (a, b, s) => (a, b) -> s }.toMap
    assert(scored((0L, 1L)) > 0.6)
    assert(scored((2L, 3L)) > 0.5)
    scored.filterKeys(k => !Set((0L, 1L), (2L, 3L)).contains(k))
      .values.foreach(s => assert(s < 0.5))
  }

  test("scores are in [0, 1]") {
    val all = jaccardMatcher.score(records).select("score").as[Double].collect() ++
      ruleMatcher.score(records).select("score").as[Double].collect()
    all.foreach(s => assert(s >= 0.0 && s <= 1.0))
  }

  test("matches applies the threshold inclusively") {
    val scored = jaccardMatcher.score(records).as[(Long, Long, Double)].collect()
    val t = scored.map(_._3).max
    val got = jaccardMatcher.matches(records, t).as[(Long, Long, Double)].collect()
    assert(got.nonEmpty)
    got.foreach { case (_, _, s) => assert(s >= t) }
  }

  test("raising the threshold never adds matches (monotonicity)") {
    val low = jaccardMatcher.matches(records, 0.3).count()
    val high = jaccardMatcher.matches(records, 0.7).count()
    assert(high <= low)
  }

  test("clustering transitively closes the matches") {
    val clustering = jaccardMatcher.clustering(spark, records, 0.5)
    val byId = clustering.as[(Long, Long)].collect().toMap
    assert(byId(0L) == byId(1L))
    assert(byId(2L) == byId(3L))
    assert(byId(0L) != byId(2L))
    assert(byId.keySet == (0L to 5L).toSet)
  }

  test("weighted rule matcher: weights shift scores toward heavy attributes") {
    val nameHeavy = WeightedRuleMatcher("nh",
      Seq(AttributeRule("name", 10.0), AttributeRule("cpu", 0.1)), Seq("name"))
    val cpuHeavy = WeightedRuleMatcher("ch",
      Seq(AttributeRule("name", 0.1), AttributeRule("cpu", 10.0)), Seq("name"))
    // pair (2,3): name differs by one token, cpu differs by one token out of two
    val n = nameHeavy.score(records).as[(Long, Long, Double)].collect()
      .find(r => r._1 == 2L && r._2 == 3L).get._3
    val c = cpuHeavy.score(records).as[(Long, Long, Double)].collect()
      .find(r => r._1 == 2L && r._2 == 3L).get._3
    assert(n > c) // name sim (3/4) > cpu sim (2/3... weighted)
  }

  test("one-sided null scores 0 for that attribute but keeps its weight active") {
    val cpuOnly = WeightedRuleMatcher("co",
      Seq(AttributeRule("name", 0.001), AttributeRule("cpu", 10.0)), Seq("name"))
    // record 5 has null cpu; any pair with it should score near 0 on cpu
    val recs = Seq(
      (0L, "zenbook flip alpha", "intel chip"),
      (1L, "zenbook flip alpha", null.asInstanceOf[String]),
    ).toDF("id", "name", "cpu")
    val s = cpuOnly.score(recs).as[(Long, Long, Double)].collect().head._3
    assert(s < 0.01)
  }

  test("both-null attribute is excluded from the weighted mean") {
    val m = WeightedRuleMatcher("bn",
      Seq(AttributeRule("name", 1.0), AttributeRule("cpu", 100.0)), Seq("name"))
    val recs = Seq(
      (0L, "zenbook flip alpha", null.asInstanceOf[String]),
      (1L, "zenbook flip alpha", null.asInstanceOf[String]),
    ).toDF("id", "name", "cpu")
    val s = m.score(recs).as[(Long, Long, Double)].collect().head._3
    assert(s == 1.0) // cpu carries no signal, name is identical
  }

  test("knownVocab discounts shared tokens the solution does not know") {
    val recs = Seq(
      (0L, "common alpha beta", "x"),
      (1L, "common alpha delta", "x"),
    ).toDF("id", "name", "cpu")
    val full = WeightedRuleMatcher("f", Seq(AttributeRule("name", 1.0)), Seq("name"), maxBlockSize = 10)
    // 'alpha' is shared but out-of-vocabulary; 'common' keeps the block alive
    val restricted = full.copy(knownVocab = Some(Set("common", "beta", "delta")))
    val sFull = full.score(recs).as[(Long, Long, Double)].collect().head._3
    val sRestricted = restricted.score(recs).as[(Long, Long, Double)].collect().head._3
    assert(math.abs(sFull - 2.0 / 4) < 1e-9)
    assert(math.abs(sRestricted - 3.0 / 8) < 1e-9) // (|inter| + |known inter|) / 2|union|
  }

  test("end-to-end: perfect matcher on clean duplicates reaches f1 = 1") {
    val recs = Seq(
      (0L, "unique pair alphaone"), (1L, "unique pair alphaone"),
      (2L, "unique pair betatwo"), (3L, "unique pair betatwo"),
      (4L, "solo record gammathree"),
    ).toDF("id", "name")
    val gold = Seq((0L, 0L), (1L, 0L), (2L, 1L), (3L, 1L), (4L, 2L)).toDF("id", "cluster")
    val m = TokenJaccardMatcher("p", Seq("name"), Seq("name"))
    val clustering = m.clustering(spark, recs, 0.99)
    val cm = MetricsEngine.confusionMatrix(clustering, gold, 5)
    assert(repro.core.PairMetrics.f1(cm) == 1.0)
  }

  test("rule matcher rejects all-zero weights") {
    assertThrows[IllegalArgumentException](
      WeightedRuleMatcher("z", Seq(AttributeRule("name", 0.0)), Seq("name")))
  }

  test("levenshtein and equality measures are usable in rules") {
    val recs = Seq(
      (0L, "thinkpadd", "8gb"),
      (1L, "thinkpad", "8gb"),
    ).toDF("id", "name", "ram")
    val m = WeightedRuleMatcher("le",
      Seq(AttributeRule("name", 1.0, "levenshtein"), AttributeRule("ram", 1.0, "equality")),
      Seq("name", "ram"), maxBlockSize = 10)
    val s = m.score(recs).as[(Long, Long, Double)].collect().head._3
    val expected = ((1.0 - 1.0 / 9) + 1.0) / 2
    assert(math.abs(s - expected) < 1e-9)
  }

  test("unknown measure fails loudly") {
    assertThrows[RuntimeException] {
      val m = WeightedRuleMatcher("u", Seq(AttributeRule("name", 1.0, "cosine")), Seq("name"))
      m.score(records).collect()
    }
  }
}
