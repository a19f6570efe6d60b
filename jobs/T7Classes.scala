package repro.jobs

import repro.tables.T7Classes

/** spark-submit entrypoint for T7 (Fig. 6g / Fig. 6l).
  * Usage: T7Classes [n] [f] [seed]
  */
object T7ClassesJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T7Classes")
    val rows = T7Classes.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(10000L),
      f = args.lift(1).map(_.toDouble).getOrElse(0.05),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T7Classes.format(rows))
    spark.stop()
  }
}
