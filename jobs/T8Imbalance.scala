package repro.jobs

import repro.tables.T8Imbalance

/** spark-submit entrypoint for T8 (Fig. 6j).
  * Usage: T8Imbalance [n] [seed]
  */
object T8ImbalanceJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T8Imbalance")
    val rows = T8Imbalance.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(10000L),
      seed = args.lift(1).map(_.toLong).getOrElse(0L))
    println(T8Imbalance.format(rows))
    spark.stop()
  }
}
