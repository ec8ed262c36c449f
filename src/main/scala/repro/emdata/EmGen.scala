package repro.emdata

import scala.collection.mutable
import scala.util.Random

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._

/** Generator for dirty entity-matching datasets with gold standard.
  *
  * Stands in for the paper's benchmark datasets (SIGMOD contest notebooks,
  * Cora, CDs, Songs): every cluster is one real-world entity; duplicate
  * records are corrupted copies (nulled values, dropped/swapped tokens).
  * The generator controls exactly the statistics Frost profiles in Table 2:
  * tuple count, sparsity, textuality, positive ratio, and (via [[Vocab]]
  * pools) vocabulary similarity. Deterministic in `seed`.
  */
object EmGen {

  /** One attribute of the schema.
    *
    * @param meanWords target mean token count of non-null values (drives TX)
    * @param nullRate  probability a value is null (drives SP)
    * @param zipf      draw tokens Zipf-distributed (rare tokens exist → the
    *                  attribute is usable for token blocking); uniform
    *                  otherwise (full pool coverage → exact VS)
    */
  final case class AttrSpec(name: String, meanWords: Double, nullRate: Double, zipf: Boolean = false) {
    require(meanWords >= 1, s"meanWords must be >= 1 for $name")
    require(nullRate >= 0 && nullRate < 1, s"nullRate out of range for $name")
  }

  /** Full dataset spec. `dupClusters` lists (clusterSize, count) of the
    * duplicate clusters; remaining records are singletons.
    */
  final case class EmSpec(
      name: String,
      nRecords: Int,
      dupClusters: Seq[(Int, Int)],
      attrs: Seq[AttrSpec],
      pool: IndexedSeq[String],
      dropRate: Double = 0.05,
      swapRate: Double = 0.03,
      positiveRatio: Double = 0.05,
      zipfAlpha: Double = 1.1,
      seed: Long = 7,
  ) {
    require(attrs.nonEmpty, "need at least one attribute")
    require(pool.nonEmpty, "empty vocabulary pool")
    val dupRecords: Int = dupClusters.map { case (s, c) => s * c }.sum
    require(dupRecords <= nRecords, s"$name: duplicate records $dupRecords exceed $nRecords")
    require(positiveRatio > 0 && positiveRatio < 1, "positiveRatio must be in (0,1)")

    /** Number of true duplicate pairs implied by the cluster structure. */
    def goldPairCount: Long =
      dupClusters.map { case (s, c) => c.toLong * s * (s - 1) / 2 }.sum
  }

  /** Generated dataset: records, gold clustering (both as DataFrame and as
    * a record-indexed array), and a labeled pair sample with the spec's
    * positive ratio (the "development set" practitioners label).
    */
  final case class EmDataset(
      spec: EmSpec,
      records: DataFrame,
      gold: DataFrame,
      goldArray: Array[Int],
      labeledPairs: DataFrame,
  )

  /** Zipf sampler over `0 until n` with exponent `alpha`. */
  private final class ZipfSampler(n: Int, alpha: Double, rnd: Random) {
    private val cum = new Array[Double](n)
    locally {
      var acc = 0.0
      var i = 0
      while (i < n) { acc += 1.0 / math.pow(i + 1.0, alpha); cum(i) = acc; i += 1 }
      i = 0
      while (i < n) { cum(i) /= acc; i += 1 }
    }
    def next(): Int = {
      val u = rnd.nextDouble()
      var lo = 0; var hi = n - 1
      while (lo < hi) {
        val mid = (lo + hi) >>> 1
        if (cum(mid) < u) lo = mid + 1 else hi = mid
      }
      lo
    }
  }

  def generate(spark: SparkSession, spec: EmSpec): EmDataset = {
    val rnd = new Random(spec.seed)
    // Shuffle the pool so Zipf frequency ranks do not align with the pool's
    // construction order (global/common/exclusive token classes) — in real
    // data, shared domain words are not systematically the frequent ones.
    val pool = rnd.shuffle(spec.pool)
    val zipf = new ZipfSampler(pool.size, spec.zipfAlpha, rnd)

    def drawValue(attr: AttrSpec): Array[String] = {
      val k = math.max(1, math.round(attr.meanWords + rnd.nextGaussian() * attr.meanWords / 5.0).toInt)
      Array.fill(k) {
        val idx = if (attr.zipf) zipf.next() else rnd.nextInt(pool.size)
        pool(idx)
      }
    }

    def corrupt(tokens: Array[String], attr: AttrSpec): String = {
      if (rnd.nextDouble() < attr.nullRate) return null
      val kept = tokens.flatMap { t =>
        if (rnd.nextDouble() < spec.dropRate) None
        else if (rnd.nextDouble() < spec.swapRate) Some(pool(rnd.nextInt(pool.size)))
        else Some(t)
      }
      val out = if (kept.isEmpty) Array(tokens(rnd.nextInt(tokens.length))) else kept
      out.mkString(" ")
    }

    val gold = new Array[Int](spec.nRecords)
    val rows = new mutable.ArrayBuffer[Row](spec.nRecords)
    var recId = 0
    var clusterId = 0

    // Duplicate clusters: one entity per cluster, corrupted copies.
    spec.dupClusters.foreach { case (size, count) =>
      var c = 0
      while (c < count) {
        val entity = spec.attrs.map(a => (a, drawValue(a)))
        var s = 0
        while (s < size) {
          gold(recId) = clusterId
          rows += Row.fromSeq(recId.toLong +: clusterId.toLong +: entity.map { case (a, v) => corrupt(v, a) })
          recId += 1; s += 1
        }
        clusterId += 1; c += 1
      }
    }
    // Singletons.
    while (recId < spec.nRecords) {
      val entity = spec.attrs.map(a => (a, drawValue(a)))
      gold(recId) = clusterId
      rows += Row.fromSeq(recId.toLong +: clusterId.toLong +: entity.map { case (a, v) => corrupt(v, a) })
      recId += 1; clusterId += 1
    }

    val schema = StructType(
      StructField("id", LongType, nullable = false) +:
        StructField("cluster", LongType, nullable = false) +:
        spec.attrs.map(a => StructField(a.name, StringType, nullable = true))
    )
    import scala.jdk.CollectionConverters._
    val records = spark.createDataFrame(rows.asJava, schema)
    val goldDf = records.select("id", "cluster")

    EmDataset(spec, records, goldDf, gold, labeledPairs(spark, spec, gold, rnd))
  }

  /** Labeled pair sample: all true duplicate pairs plus uniformly sampled
    * non-duplicate pairs so that positives / total = spec.positiveRatio.
    */
  private def labeledPairs(spark: SparkSession, spec: EmSpec, gold: Array[Int], rnd: Random): DataFrame = {
    val positives = mutable.ArrayBuffer.empty[(Long, Long, Boolean)]
    // Members per duplicate cluster are contiguous by construction.
    var base = 0
    spec.dupClusters.foreach { case (size, count) =>
      var c = 0
      while (c < count) {
        var i = 0
        while (i < size) {
          var j = i + 1
          while (j < size) { positives += (((base + i).toLong, (base + j).toLong, true)); j += 1 }
          i += 1
        }
        base += size; c += 1
      }
    }
    val nNeg = math.round(positives.size * (1 - spec.positiveRatio) / spec.positiveRatio).toInt
    val negatives = mutable.HashSet.empty[(Long, Long)]
    val n = spec.nRecords
    var attempts = 0
    while (negatives.size < nNeg && attempts < nNeg * 50 + 1000) {
      val a = rnd.nextInt(n); val b = rnd.nextInt(n)
      attempts += 1
      if (a != b && gold(a) != gold(b)) {
        negatives += ((math.min(a, b).toLong, math.max(a, b).toLong))
      }
    }
    require(negatives.size == nNeg, s"${spec.name}: could not sample $nNeg negative pairs")
    import spark.implicits._
    (positives.toSeq ++ negatives.iterator.map { case (a, b) => (a, b, false) }.toSeq)
      .toDF("a", "b", "label")
  }
}
