package repro.testutil

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{GraphOps, SparseGraph}
import repro.linalg.Dense

/** Helpers to lift small driver-side graphs into the distributed layer. */
object LocalGraphs {

  /** SparseGraph from an undirected edge list. */
  def graph(spark: SparkSession, n: Int, undirected: Seq[(Int, Int)]): SparseGraph = {
    import spark.implicits._
    GraphOps.fromUndirected(
      spark, n, undirected.map { case (a, b) => (a.toLong, b.toLong) }.toDF("src", "dst"))
  }

  /** Labels DataFrame (node, cls) from a map. */
  def labels(spark: SparkSession, m: Map[Int, Int]): DataFrame = {
    import spark.implicits._
    m.toSeq.map { case (node, cls) => (node.toLong, cls) }.toDF("node", "cls")
  }

  /** Long-format (node, cls, v) DataFrame from a dense n×k matrix,
    * omitting exact zeros (the long layout's convention).
    */
  def longFormat(spark: SparkSession, m: Dense): DataFrame = {
    import spark.implicits._
    (for {
      i <- 0 until m.rows
      j <- 0 until m.cols
      if m(i, j) != 0.0
    } yield (i.toLong, j, m(i, j))).toDF("node", "cls", "v")
  }

  /** Collect a long-format DataFrame back to dense for comparison. */
  def toDense(df: DataFrame, n: Int, k: Int): Dense = GraphOps.collectDense(df, n, k)
}
