package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Connected components over an undirected edge list — the transitive
  * closure step Frost applies to turn a set of matches into an experiment
  * clustering (Frost, Section 1.2 / 4.2.4).
  *
  * Implemented as iterative minimum-label propagation on DataFrames: every
  * record starts labelled with its own ID; each round every record adopts
  * the minimum label in its closed neighbourhood, until a fixpoint. Rounds
  * are O(component diameter); match graphs from deduplication have tiny
  * components so this converges in a handful of rounds.
  */
object ConnectedComponents {

  /** Components of the graph induced by `edges` over exactly the node set
    * appearing in `edges`.
    *
    * @param edges DataFrame with long columns `src`, `dst` (unordered pairs)
    * @return DataFrame (id: Long, cluster: Long), `cluster` = component min ID
    */
  def components(edges: DataFrame, maxIter: Int = 50): DataFrame = {
    // localCheckpoint each iteration: without it the self-referential join
    // lineage grows every round and Catalyst re-plans the whole history,
    // which dominates runtime after a few dozen iterations.
    val sym = edges.select(col("src"), col("dst"))
      .union(edges.select(col("dst").as("src"), col("src").as("dst")))
      .distinct()
      .localCheckpoint(true)
    val nodes = sym.select(col("src").as("id")).distinct()

    var labels = nodes.select(col("id"), col("id").as("cluster")).localCheckpoint(true)
    var converged = false
    var iter = 0
    while (!converged && iter < maxIter) {
      val neighborMin = sym
        .join(labels, sym("dst") === labels("id"))
        .groupBy(sym("src").as("id"))
        .agg(min(col("cluster")).as("nmin"))
      val joined = labels.as("l")
        .join(neighborMin.as("m"), col("l.id") === col("m.id"), "left")
        .select(
          col("l.id").as("id"),
          col("l.cluster").as("old"),
          least(col("l.cluster"), coalesce(col("m.nmin"), col("l.cluster"))).as("cluster"),
        )
        .localCheckpoint(true)
      val changed = joined.filter(col("cluster") < col("old")).limit(1).count()
      labels = joined.select(col("id"), col("cluster"))
      converged = changed == 0
      iter += 1
    }
    labels
  }

  /** Full clustering of `records` under the transitive closure of `edges`:
    * nodes touched by an edge get their component label, all other records
    * are singletons labelled by their own ID. Runs label propagation only on
    * the induced subgraph — matches are sparse, datasets are not.
    *
    * @param records DataFrame with a unique long `id` column
    */
  def closure(records: DataFrame, edges: DataFrame, maxIter: Int = 50): DataFrame = {
    val matched = components(edges, maxIter)
    records.select(col("id"))
      .join(matched.withColumnRenamed("cluster", "ccluster"), Seq("id"), "left")
      .select(col("id"), coalesce(col("ccluster"), col("id")).as("cluster"))
  }

  /** Back-compat entry matching the original signature. */
  def run(spark: SparkSession, records: DataFrame, edges: DataFrame, maxIter: Int = 50): DataFrame =
    closure(records, edges, maxIter)
}
