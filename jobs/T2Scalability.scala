package repro.jobs

import repro.tables.T2Scalability

/** spark-submit entrypoint for T2 (Fig. 3b / Fig. 6k).
  * Usage: T2Scalability [maxN] [f] [seed]
  */
object T2ScalabilityJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T2Scalability")
    val maxN = args.lift(0).map(_.toLong).getOrElse(100000L)
    val sizes = Seq(2000L, 8000L, 32000L, 100000L, 300000L).filter(_ <= maxN)
    val rows = T2Scalability.run(spark, sizes = sizes,
      f = args.lift(1).map(_.toDouble).getOrElse(0.01),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T2Scalability.format(rows))
    spark.stop()
  }
}
