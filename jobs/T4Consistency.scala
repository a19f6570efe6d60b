package repro.jobs

import repro.tables.T4Consistency

/** spark-submit entrypoint for T4 (Fig. 5a / Example 4.2).
  * Usage: T4Consistency [n] [f] [seed]
  */
object T4ConsistencyJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T4Consistency")
    val rows = T4Consistency.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(10000L),
      f = args.lift(1).map(_.toDouble).getOrElse(0.1),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T4Consistency.format(rows))
    spark.stop()
  }
}
