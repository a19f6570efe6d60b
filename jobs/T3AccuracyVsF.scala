package repro.jobs

import repro.tables.T3AccuracyVsF

/** spark-submit entrypoint for T3 (Fig. 3a / Fig. 6f).
  * Usage: T3AccuracyVsF [n] [seed]
  */
object T3AccuracyVsFJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T3AccuracyVsF")
    val rows = T3AccuracyVsF.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(10000L),
      seed = args.lift(1).map(_.toLong).getOrElse(0L))
    println(T3AccuracyVsF.format(rows))
    spark.stop()
  }
}
