package repro.jobs

import repro.tables.T6Restarts

/** spark-submit entrypoint for T6 (Fig. 6h).
  * Usage: T6Restarts [n] [f] [seed]
  */
object T6RestartsJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T6Restarts")
    val rows = T6Restarts.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(10000L),
      f = args.lift(1).map(_.toDouble).getOrElse(0.003),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T6Restarts.format(rows))
    spark.stop()
  }
}
