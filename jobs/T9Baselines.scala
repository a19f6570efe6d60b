package repro.jobs

import repro.tables.T9Baselines

/** spark-submit entrypoint for T9 (Fig. 6i).
  * Usage: T9Baselines [n] [seed]
  */
object T9BaselinesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T9Baselines")
    val rows = T9Baselines.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(10000L),
      seed = args.lift(1).map(_.toLong).getOrElse(0L))
    println(T9Baselines.format(rows))
    spark.stop()
  }
}
