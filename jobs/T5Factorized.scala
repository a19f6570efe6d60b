package repro.jobs

import repro.tables.T5Factorized

/** spark-submit entrypoint for T5 (Fig. 5b / Example 4.6).
  * Usage: T5Factorized [n] [explicitMaxL] [seed]
  */
object T5FactorizedJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("T5Factorized")
    val rows = T5Factorized.run(spark,
      n = args.lift(0).map(_.toLong).getOrElse(3000L),
      explicitMaxL = args.lift(1).map(_.toInt).getOrElse(4),
      seed = args.lift(2).map(_.toLong).getOrElse(0L))
    println(T5Factorized.format(rows))
    spark.stop()
  }
}
