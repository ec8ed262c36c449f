package repro.tables

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.{ConfusionMatrix, MetricDiagram, MetricsEngine, PairMetrics, ScoredMatch}
import repro.emdata.{DatasetSpecs, EmGen}
import repro.graph.ConnectedComponents
import repro.matching.{Blocking, Similarity}

/** Table 3: transfer of matching solutions across datasets — average
  * precision / recall / f1 of solutions "developed on X2" and "developed on
  * X3", each evaluated on the train and test splits of both D2 and D3.
  *
  * Solution families (stand-ins for the contest teams' solutions, see
  * DESIGN.md): weighted-rule matchers whose per-attribute weights and
  * similarity vocabulary are "learned" on their home training dataset.
  *  - X2-family: weights the verbose spec attributes (description, cpu,
  *    ram, screen) that X2 populates densely — on the sparse D3 these are
  *    mostly null, the paper's *material mismatch*.
  *  - X3-family: weights the name attribute, which survives sparsity.
  * Both families only know their training vocabulary: out-of-vocabulary
  * tokens neither form blocks nor contribute to similarity — the mechanism
  * behind the vocabulary-similarity effects of Appendix C.2.
  * Each matcher's threshold is tuned on its home training dataset with the
  * platform's own metric/metric diagram machinery (max f1).
  */
object Table3 {

  val attrs: Seq[String] = Seq("name", "description", "cpu", "ram", "screen")

  /** One solution: per-attribute weights (aligned with `attrs`). */
  final case class Solution(name: String, family: String, weights: Map[String, Double])

  val solutions: Seq[Solution] = Seq(
    Solution("x2-a", "X2", Map("name" -> 1, "description" -> 5, "cpu" -> 2, "ram" -> 2, "screen" -> 2)),
    Solution("x2-b", "X2", Map("name" -> 1, "description" -> 6, "cpu" -> 1, "ram" -> 1, "screen" -> 1)),
    Solution("x2-c", "X2", Map("name" -> 2, "description" -> 4, "cpu" -> 2, "ram" -> 2, "screen" -> 2)),
    Solution("x3-a", "X3", Map("name" -> 6, "description" -> 1, "cpu" -> 1, "ram" -> 1, "screen" -> 1)),
    Solution("x3-b", "X3", Map("name" -> 8, "description" -> 1, "cpu" -> 0.5, "ram" -> 0.5, "screen" -> 0.5)),
    Solution("x3-c", "X3", Map("name" -> 5, "description" -> 2, "cpu" -> 1, "ram" -> 1, "screen" -> 1)),
  )

  final case class Cell(precision: Double, recall: Double, f1: Double)

  /** Measured result: (family, dataset) -> averaged metrics, plus the tuned
    * thresholds per solution for the record.
    */
  final case class Result(cells: Map[(String, String), Cell], thresholds: Map[String, Double])

  /** Paper's Table 3 (as extracted; the paper's prose gives f1 = 47.0% on
    * X3 and 35.7% on Z3 for the X2-developed solutions, i.e. the two cells
    * appear transposed in the extracted table).
    */
  val paper: Map[(String, String), Cell] = Map(
    ("X2", "X2") -> Cell(1.000, 0.996, 0.998),
    ("X2", "Z2") -> Cell(0.977, 0.970, 0.974),
    ("X2", "X3") -> Cell(0.469, 0.562, 0.470),
    ("X2", "Z3") -> Cell(0.901, 0.432, 0.357),
    ("X3", "X2") -> Cell(0.763, 0.895, 0.813),
    ("X3", "Z2") -> Cell(0.685, 0.950, 0.796),
    ("X3", "X3") -> Cell(0.697, 0.972, 0.765),
    ("X3", "Z3") -> Cell(0.986, 0.975, 0.982),
  )

  /** Per-attribute similarity table for one (dataset, family-vocabulary):
    * candidate pairs with an activity flag and a vocabulary-restricted token
    * Jaccard per attribute. All solutions of a family score as weighted
    * means over these columns, so the expensive blocking + similarity work
    * is shared across the family (the computation is identical to running
    * each WeightedRuleMatcher end-to-end).
    */
  def familySims(records: DataFrame, vocab: Set[String], maxBlockSize: Int = 60): DataFrame = {
    val candidates = Blocking.tokenBlocking(records, Seq("name"), maxBlockSize, knownVocab = Some(vocab))
    val left  = records.select((col("id").as("a") +: attrs.map(c => col(c).as(s"la_$c"))).toSeq: _*)
    val right = records.select((col("id").as("b") +: attrs.map(c => col(c).as(s"rb_$c"))).toSeq: _*)
    val joined = candidates.join(left, Seq("a")).join(right, Seq("b"))
    val jac = Similarity.tokenJaccardKnownUdf(vocab)
    val simCols = attrs.flatMap { at =>
      val l = col(s"la_$at"); val r = col(s"rb_$at")
      Seq(
        when(l.isNotNull || r.isNotNull, 1.0).otherwise(0.0).as(s"act_$at"),
        when(l.isNull || r.isNull, 0.0).otherwise(jac(l, r)).as(s"sim_$at"),
      )
    }
    joined.select((col("a") +: col("b") +: simCols).toSeq: _*)
  }

  /** Score column of one solution over a familySims table. */
  def scoreOf(sol: Solution): org.apache.spark.sql.Column = {
    val num = attrs.map(at => lit(sol.weights(at)) * col(s"sim_$at")).reduce(_ + _)
    val den = attrs.map(at => lit(sol.weights(at)) * col(s"act_$at")).reduce(_ + _)
    when(den > 0, num / den).otherwise(lit(0.0))
  }

  /** Tune a solution's threshold on its home training data: sweep the
    * metric/metric diagram (the platform's own machinery) and return the
    * f1-maximizing similarity threshold.
    */
  def tuneThreshold(scored: Array[ScoredMatch], n: Int, gold: Array[Int], samplePoints: Int = 2001): Double = {
    require(scored.nonEmpty, "no scored candidates to tune on")
    // Snapshots are O(1) in the incremental algorithm, so a fine sweep is
    // cheap — essential when true matches are a thin high-score slice of a
    // large candidate set (a coarse sweep's first boundary would already
    // admit junk candidates and every sampled threshold would look bad).
    val s = math.min(samplePoints, scored.length + 1).max(2)
    val sorted = scored.sortBy(-_.score)
    val matrices = MetricDiagram.custom(n, gold, sorted, s)
    val boundaries = Array.tabulate(s)(i => ((i.toLong * sorted.length) / (s - 1)).toInt)
    val candidates = matrices.zipWithIndex.filter { case (_, i) => boundaries(i) > 0 }
    val best = candidates.maxBy { case (m, _) => PairMetrics.f1(m) }._2
    sorted(boundaries(best) - 1).score
  }

  final case class Dataset(name: String, records: DataFrame, gold: DataFrame, goldArray: Array[Int], n: Int)

  def loadDatasets(spark: SparkSession): Seq[Dataset] =
    Seq(DatasetSpecs.x2, DatasetSpecs.z2, DatasetSpecs.x3, DatasetSpecs.z3).map { spec =>
      val d = EmGen.generate(spark, spec)
      d.records.cache().count()
      Dataset(spec.name, d.records, d.gold, d.goldArray, spec.nRecords)
    }

  def run(spark: SparkSession): Result = {
    val datasets = loadDatasets(spark)
    val byName = datasets.map(d => d.name -> d).toMap
    val vocabs = Map(
      "X2" -> DatasetSpecs.x2.pool.toSet,
      "X3" -> DatasetSpecs.x3.pool.toSet,
    )

    // Shared per-(dataset, family) similarity tables.
    val sims: Map[(String, String), DataFrame] =
      (for (d <- datasets; fam <- Seq("X2", "X3")) yield {
        val df = familySims(d.records, vocabs(fam)).cache()
        df.count()
        ((d.name, fam), df)
      }).toMap

    // Threshold tuning on the home training dataset.
    val thresholds: Map[String, Double] = solutions.map { sol =>
      val home = byName(sol.family)
      val scored = sims((home.name, sol.family))
        .select(col("a").cast("int"), col("b").cast("int"), scoreOf(sol).as("score"))
        .collect()
        .map(r => ScoredMatch(r.getInt(0), r.getInt(1), r.getDouble(2)))
      sol.name -> tuneThreshold(scored, home.n, home.goldArray)
    }.toMap

    // Evaluate every solution on every dataset; average per family.
    val perSolution: Seq[((String, String), Cell)] = for {
      sol <- solutions
      d <- datasets
    } yield {
      val t = thresholds(sol.name)
      val edges = sims((d.name, sol.family))
        .select(col("a"), col("b"), scoreOf(sol).as("score"))
        .filter(col("score") >= t)
        .select(col("a").as("src"), col("b").as("dst"))
      val clustering = ConnectedComponents.closure(d.records, edges)
      val cm = MetricsEngine.confusionMatrix(clustering, d.gold, d.n.toLong)
      ((sol.family, d.name), Cell(PairMetrics.precision(cm), PairMetrics.recall(cm), PairMetrics.f1(cm)))
    }
    val cells = perSolution.groupBy(_._1).map { case (key, vs) =>
      val cs = vs.map(_._2)
      key -> Cell(avg(cs.map(_.precision)), avg(cs.map(_.recall)), avg(cs.map(_.f1)))
    }
    sims.values.foreach(_.unpersist())
    datasets.foreach(_.records.unpersist())
    Result(cells, thresholds)
  }

  private def avg(xs: Seq[Double]): Double = xs.sum / xs.size

  def format(r: Result): String = {
    val dsOrder = Seq("X2", "Z2", "X3", "Z3")
    val lines = for (fam <- Seq("X2", "X3")) yield {
      val rows = dsOrder.map { ds =>
        val m = r.cells((fam, ds))
        val p = paper((fam, ds))
        f"  on $ds%-3s P ${m.precision * 100}%5.1f%% R ${m.recall * 100}%5.1f%% F1 ${m.f1 * 100}%5.1f%%" +
          f"   (paper: P ${p.precision * 100}%5.1f%% R ${p.recall * 100}%5.1f%% F1 ${p.f1 * 100}%5.1f%%)"
      }
      (s"developed on $fam:" +: rows).mkString("\n")
    }
    val ts = solutions.map(s => f"${s.name}=${r.thresholds(s.name)}%.3f").mkString(", ")
    lines.mkString("\n") + s"\ntuned thresholds: $ts"
  }
}
