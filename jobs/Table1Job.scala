package repro.jobs

import repro.tables.Table1

/** spark-submit entrypoint for Table 1 (runtime of metric/metric diagrams).
  * The algorithms under test are driver-side (they are Snowman's in-memory
  * evaluation core); no SparkSession is needed here.
  *
  * Usage: spark-submit --class repro.jobs.Table1Job <jar> [reps]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val reps = args.headOption.map(_.toInt).getOrElse(2)
    val results = Table1.runAll(reps)
    println(Table1.format(results))
  }
}
