package repro.jobs

import repro.tables.T1RealWorld

/** spark-submit entrypoint for T1 (Fig. 8 + Fig. 14).
  * Usage: T1RealWorld [maxEdges] [f] [seed]
  */
object T1RealWorldJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T1RealWorld")
    val rows = T1RealWorld.run(spark,
      maxEdges = args.lift(0).map(_.toLong).getOrElse(150000L),
      f = args.lift(1).map(_.toDouble).getOrElse(0.01),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T1RealWorld.format(rows))
    spark.stop()
  }
}
