package repro.tables

import repro.core.{ConfusionMatrix, MetricDiagram, ScoredMatch}
import repro.matching.ExperimentGen

/** Table 1: runtime of pair-based metric/metric diagrams — Snowman's custom
  * incremental algorithm vs the naïve per-threshold recomputation, 100
  * similarity thresholds per diagram.
  *
  * Workloads mirror the paper's five datasets in the two quantities the
  * algorithms depend on: record count and matched-pair count. Record
  * content is irrelevant to both algorithms (they consume record indices,
  * a gold clustering, and scored matches), so experiments are synthesized
  * by [[ExperimentGen]] at the paper's exact sizes.
  */
object Table1 {

  /** One workload: the paper's dataset sizes plus the gold cluster size used
    * to supply enough true pairs.
    */
  final case class Workload(dataset: String, records: Int, matchedPairs: Int, clusterSize: Int, seed: Long)

  /** The paper's five datasets (record and matched-pair counts from Table 1). */
  val workloads: Seq[Workload] = Seq(
    Workload("Altosight X4",   835,       4005,   11, seed = 201),
    Workload("HPI Cora",       1879,      5067,   10, seed = 202),
    Workload("FreeDB CDs",     9763,      147,    2,  seed = 203),
    Workload("Songs 100k",     100000,    45801,  3,  seed = 204),
    Workload("Magellan Songs", 1000000,   144349, 3,  seed = 205),
  )

  /** Fraction of synthesized matches that are false positives — scores of
    * true and false matches overlap so the threshold sweep is non-trivial.
    */
  val fpRate = 0.08

  /** Sample points per diagram, as in the paper ("100 different similarity
    * thresholds were calculated").
    */
  val samplePoints = 100

  final case class Result(
      dataset: String,
      records: Int,
      matchedPairs: Int,
      customMs: Double,
      naiveMs: Double,
  ) {
    def speedup: Double = naiveMs / customMs
  }

  /** Build a workload's gold clustering and scored experiment. */
  def build(w: Workload): (Array[Int], IndexedSeq[ScoredMatch]) = {
    val tpBudget = math.round(w.matchedPairs * (1 - fpRate)).toInt
    val gold = ExperimentGen.goldForPairBudget(w.records, tpBudget, w.clusterSize)
    val matches = ExperimentGen.scoredExperiment(gold, w.matchedPairs, fpRate, w.seed)
    (gold, matches)
  }

  private def timeMs[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    ((a, (System.nanoTime() - t0) / 1e6))
  }

  /** Run one workload; asserts both algorithms produce identical confusion
    * matrices before trusting the timings. `reps` timed repetitions, best
    * taken (JIT-stable).
    */
  def run(w: Workload, reps: Int = 2): Result = {
    val (gold, matches) = build(w)
    var customBest = Double.MaxValue
    var naiveBest = Double.MaxValue
    var customOut: IndexedSeq[ConfusionMatrix] = null
    var naiveOut: IndexedSeq[ConfusionMatrix] = null
    (1 to reps).foreach { _ =>
      val (c, ct) = timeMs(MetricDiagram.custom(w.records, gold, matches, samplePoints))
      val (n, nt) = timeMs(MetricDiagram.naive(w.records, gold, matches, samplePoints))
      customOut = c; naiveOut = n
      customBest = math.min(customBest, ct)
      naiveBest = math.min(naiveBest, nt)
    }
    require(customOut == naiveOut,
      s"${w.dataset}: custom and naive disagree — custom head ${customOut.take(3)}, naive head ${naiveOut.take(3)}")
    Result(w.dataset, w.records, w.matchedPairs, customBest, naiveBest)
  }

  /** Run all workloads (with a JIT warmup on the smallest). */
  def runAll(reps: Int = 2): Seq[Result] = {
    run(workloads.head, reps = 1) // warmup
    workloads.map(run(_, reps))
  }

  def format(results: Seq[Result]): String = {
    val header = f"${"Dataset"}%-16s ${"Records"}%10s ${"Matches"}%10s ${"Custom"}%12s ${"Naive"}%12s ${"Speedup"}%8s"
    val rows = results.map { r =>
      f"${r.dataset}%-16s ${r.records}%10d ${r.matchedPairs}%10d ${r.customMs}%10.1fms ${r.naiveMs}%10.1fms ${r.speedup}%7.1fx"
    }
    (header +: rows).mkString("\n")
  }
}
