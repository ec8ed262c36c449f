package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the provided TPC-H-lite generators, plus a
  * DuckDB-oracle round-trip on a join-aggregate query — exercises the
  * Oracle harness itself.
  */
class SynthDataSpec extends SparkSpec {

  private val sf = 0.001

  test("lineitem has the expected shape and value ranges") {
    val li = SynthData.lineitem(spark, sf).cache()
    assert(li.count() > 0)
    val row = li.agg(
      min("l_quantity").as("minq"), max("l_quantity").as("maxq"),
      min("l_discount").as("mind"), max("l_discount").as("maxd"),
    ).collect()(0)
    assert(row.getAs[Double]("minq") >= 1.0 && row.getAs[Double]("maxq") <= 51.0)
    assert(row.getAs[Double]("mind") >= 0.0 && row.getAs[Double]("maxd") <= 0.10)
    li.unpersist()
  }

  test("orders keys are dense from 1") {
    val o = SynthData.orders(spark, sf)
    val r = o.agg(min("o_orderkey").as("mn"), max("o_orderkey").as("mx"), count(lit(1)).as("n")).collect()(0)
    assert(r.getAs[Long]("mn") == 1L)
    assert(r.getAs[Long]("mx") == r.getAs[Long]("n"))
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, sf).collect().map(_.toString).sorted
    val b = SynthData.customer(spark, sf).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("zipfKeys skews mass toward small keys") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0)
    assert(top.getAs[Long]("k") <= 3, "most frequent key should be a small rank")
  }

  test("uniformKeys covers the key space roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getAs[Long]("count"))
    assert(counts.length == 10)
    assert(counts.max.toDouble / counts.min < 1.5)
  }

  test("oracle round-trip: grouped aggregate over a join matches DuckDB") {
    val li = SynthData.lineitem(spark, sf).limit(2000).cache()
    val o = SynthData.orders(spark, sf).limit(500).cache()
    val sparkSide = li.join(o, li("l_orderkey") === o("o_orderkey"))
      .groupBy(col("o_orderstatus"))
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkSide,
      """SELECT o_orderstatus, count(*) AS cnt
        |FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li,
      "orders" -> o,
    )
    li.unpersist(); o.unpersist()
  }
}
