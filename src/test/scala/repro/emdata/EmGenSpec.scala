package repro.emdata

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.Profiling

class EmGenSpec extends SparkSpec {

  private lazy val spec = DatasetSpecs.tiny(n = 400, seed = 21, sp = 0.15)
  private lazy val ds = EmGen.generate(spark, spec)
  private lazy val attrs = spec.attrs.map(_.name)

  test("record count matches the spec") {
    assert(ds.records.count() == spec.nRecords)
  }

  test("ids are unique and sequential from 0") {
    val ids = ds.records.select("id").as[Long](org.apache.spark.sql.Encoders.scalaLong)
      .collect().sorted
    assert(ids.toSeq == (0L until spec.nRecords.toLong))
  }

  test("gold DataFrame agrees with goldArray") {
    val fromDf = ds.gold.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    ds.goldArray.zipWithIndex.foreach { case (c, i) =>
      assert(fromDf(i.toLong) == c.toLong)
    }
  }

  test("duplicate cluster structure matches the spec") {
    val sizes = ds.goldArray.groupBy(identity).map(_._2.length).toSeq
    spec.dupClusters.foreach { case (size, count) =>
      assert(sizes.count(_ == size) >= count, s"expected >= $count clusters of size $size")
    }
    assert(ds.goldArray.distinct.length ==
      spec.dupClusters.map(_._2).sum + (spec.nRecords - spec.dupRecords))
  }

  test("goldPairCount matches the cluster structure") {
    val expected = spec.dupClusters.map { case (s, c) => c.toLong * s * (s - 1) / 2 }.sum
    assert(spec.goldPairCount == expected)
    assert(repro.core.ClusteringOps.pairCount(ds.gold) == expected)
  }

  test("measured sparsity is near the configured rate") {
    val sp = Profiling.sparsity(ds.records, attrs)
    val target = spec.attrs.map(_.nullRate).sum / spec.attrs.size
    assert(math.abs(sp - target) < 0.05, s"sparsity $sp vs target $target")
  }

  test("measured textuality is near the configured means") {
    val tx = Profiling.textuality(ds.records, attrs)
    val target = spec.attrs.map(_.meanWords).sum / spec.attrs.size
    assert(math.abs(tx - target) / target < 0.2, s"textuality $tx vs target $target")
  }

  test("all tokens come from the spec's pool") {
    val vocab = Profiling.vocabulary(ds.records, attrs)
      .collect().map(_.getString(0)).toSet
    assert(vocab.subsetOf(spec.pool.toSet))
  }

  test("duplicates share most of their name tokens (corruption is mild)") {
    val recs = ds.records.select("id", "cluster", "name").collect()
      .map(r => (r.getLong(0), r.getLong(1), Option(r.getString(2))))
    val byCluster = recs.groupBy(_._2).filter(_._2.length >= 2)
    val sims = byCluster.values.toSeq.flatMap { members =>
      for {
        Seq(a, b) <- members.toSeq.combinations(2)
        na <- a._3; nb <- b._3
      } yield repro.matching.Similarity.tokenJaccard(na, nb)
    }
    assert(sims.nonEmpty)
    assert(sims.sum / sims.size > 0.5, "duplicate name similarity too low")
  }

  test("non-duplicates rarely look alike") {
    val names = ds.records.filter(col("name").isNotNull)
      .select("cluster", "name").collect().map(r => (r.getLong(0), r.getString(1)))
    val rnd = new scala.util.Random(5)
    val sims = (1 to 200).flatMap { _ =>
      val a = names(rnd.nextInt(names.length)); val b = names(rnd.nextInt(names.length))
      if (a._1 != b._1) Some(repro.matching.Similarity.tokenJaccard(a._2, b._2)) else None
    }
    assert(sims.sum / sims.size < 0.2, "random cross-cluster names too similar")
  }

  test("labeled pairs hit the configured positive ratio exactly") {
    val total = ds.labeledPairs.count()
    val pos = ds.labeledPairs.filter(col("label")).count()
    assert(pos == spec.goldPairCount)
    assert(math.abs(pos.toDouble / total - spec.positiveRatio) < 0.005)
  }

  test("labeled pair labels are consistent with the gold clustering") {
    ds.labeledPairs.collect().foreach { r =>
      val a = r.getLong(0).toInt; val b = r.getLong(1).toInt; val l = r.getBoolean(2)
      assert((ds.goldArray(a) == ds.goldArray(b)) == l)
    }
  }

  test("generation is deterministic in the seed") {
    val again = EmGen.generate(spark, spec)
    assert(again.records.collect().map(_.toString).sorted.sameElements(
      ds.records.collect().map(_.toString).sorted))
  }

  test("a different seed produces different data") {
    val other = EmGen.generate(spark, spec.copy(seed = spec.seed + 1))
    assert(!other.records.collect().map(_.toString).sorted.sameElements(
      ds.records.collect().map(_.toString).sorted))
  }

  test("spec validation: oversized duplicate demand is rejected") {
    assertThrows[IllegalArgumentException](
      spec.copy(nRecords = 10, dupClusters = Seq((5, 10))))
  }
}
