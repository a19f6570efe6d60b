package repro.jobs

import repro.tables.T10Heuristics

/** spark-submit entrypoint for T10 (Fig. 12 / Appendix E.1).
  * Usage: T10Heuristics [maxEdges] [f] [seed]
  */
object T10HeuristicsJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T10Heuristics")
    val rows = T10Heuristics.run(spark,
      maxEdges = args.lift(0).map(_.toLong).getOrElse(100000L),
      f = args.lift(1).map(_.toDouble).getOrElse(0.01),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T10Heuristics.format(rows))
    spark.stop()
  }
}
