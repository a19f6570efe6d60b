package repro.jobs

import repro.tables.T11Sensitivity

/** spark-submit entrypoint for T11 (Fig. 6a / Fig. 6b).
  * Usage: T11Sensitivity [n] [f] [seed]
  */
object T11SensitivityJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T11Sensitivity")
    val result = T11Sensitivity.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(10000L),
      f = args.lift(1).map(_.toDouble).getOrElse(0.01),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T11Sensitivity.format(result))
    spark.stop()
  }
}
