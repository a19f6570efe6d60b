package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.linalg.Dense

/** An undirected graph held as a DataFrame of directed edge pairs.
  *
  * ``edges`` has columns (src: Long, dst: Long); every undirected edge
  * appears in both directions, there are no self-loops and no duplicates,
  * so W is the symmetric 0/1 adjacency matrix. Nodes are 0..n−1.
  */
final case class SparseGraph(n: Long, edges: DataFrame) {

  /** Number of undirected edges m = |E|. */
  lazy val m: Long = edges.count() / 2

  /** Node degrees (node: Long, deg: Double); degree-0 nodes are absent. */
  lazy val degrees: DataFrame = {
    val d = edges
      .groupBy(col("src").as("node"))
      .agg(count(lit(1)).cast("double").as("deg"))
      .localCheckpoint(true)
    d
  }
}

/** Distributed sparse linear algebra over the (node, cls, v) "long" layout.
  *
  * An n×k matrix (beliefs F, label matrix X, path-count sketches N) is a
  * DataFrame with columns (node: Long, cls: Int, v: Double); absent rows
  * are zeros. All operators are plain relational joins/aggregations, so
  * Catalyst plans them and the DuckDB oracle can check them as SQL.
  */
object GraphOps {

  /** Materialize and truncate lineage — required inside iterative loops,
    * where each step references the previous one (or two) results.
    */
  def materialize(df: DataFrame): DataFrame = df.localCheckpoint(true)

  /** W·F — one hop of message passing: every node sums its neighbors'
    * class-vectors. `edges ⋈ F on dst` → `groupBy (src, cls) sum(v)`.
    */
  def multiply(edges: DataFrame, f: DataFrame): DataFrame =
    edges
      .join(f.withColumnRenamed("node", "__n"), col("dst") === col("__n"))
      .groupBy(col("src").as("node"), col("cls"))
      .agg(sum("v").as("v"))

  /** F·H — modulate each node's class-vector by the k×k matrix H.
    * H is tiny, so its rows ship as a literal lookup (no join, no shuffle
    * beyond the final re-aggregation).
    */
  def applyH(f: DataFrame, h: Dense): DataFrame = {
    val rows: Array[Seq[Double]] =
      Array.tabulate(h.rows)(i => (0 until h.cols).map(j => h(i, j)))
    val rowOf = udf((c: Int) => rows(c))
    f.select(col("node"), col("v"), posexplode(rowOf(col("cls"))).as(Seq("ocls", "hv")))
      .groupBy(col("node"), col("ocls").as("cls"))
      .agg(sum(col("v") * col("hv")).as("v"))
  }

  /** Elementwise sum of two long-format matrices. */
  def plus(a: DataFrame, b: DataFrame): DataFrame =
    a.unionByName(b).groupBy("node", "cls").agg(sum("v").as("v"))

  /** Elementwise difference a − b. */
  def minus(a: DataFrame, b: DataFrame): DataFrame =
    plus(a, scale(b, -1.0))

  /** Scalar multiple. */
  def scale(f: DataFrame, s: Double): DataFrame =
    f.withColumn("v", col("v") * s)

  /** (D − c·I)·F — scale each node's row by (degree − c). */
  def diagScale(f: DataFrame, degrees: DataFrame, c: Double): DataFrame =
    f.join(degrees.withColumnRenamed("node", "__n"), col("node") === col("__n"))
      .select(col("node"), col("cls"), (col("v") * (col("deg") - lit(c))).as("v"))

  /** One-hot n×k long-format matrix from (node, cls) labels. */
  def oneHot(labels: DataFrame): DataFrame =
    labels.select(col("node"), col("cls"), lit(1.0).as("v"))

  /** Centered label matrix X̃: a node labeled c gets the residual row
    * e_c − 1/k (Section 3.1); unlabeled nodes stay absent (all-zero).
    */
  def centeredOneHot(labels: DataFrame, k: Int): DataFrame = {
    val resid = udf((c: Int) => (0 until k).map(j => if (j == c) 1.0 - 1.0 / k else -1.0 / k))
    labels.select(col("node"), posexplode(resid(col("cls"))).as(Seq("ocls", "rv")))
      .select(col("node"), col("ocls").as("cls"), col("rv").as("v"))
  }

  /** Xᵀ·N — collapse an n×k long matrix against labels into a k×k driver
    * matrix: M_cd = Σ_{i labeled c} N_id.
    */
  def collapse(labels: DataFrame, nMat: DataFrame, k: Int): Dense = {
    val rows = labels
      .withColumnRenamed("cls", "lcls")
      .join(nMat.withColumnRenamed("node", "__n"), col("node") === col("__n"))
      .groupBy(col("lcls"), col("cls"))
      .agg(sum("v").as("v"))
      .collect()
    val out = Dense.zeros(k, k).data
    rows.foreach { r =>
      out(r.getInt(0) * k + r.getInt(1)) = r.getDouble(2)
    }
    new Dense(k, k, out)
  }

  /** argmax over classes: (node, cls) with the highest belief; ties break
    * toward the smallest class id so results are deterministic.
    */
  def argmaxLabels(f: DataFrame): DataFrame =
    f.groupBy("node")
      .agg(max(struct(col("v"), (-col("cls")).as("negc"))).as("top"))
      .select(col("node"), (-col("top.negc")).cast("int").as("cls"))

  /** Spectral radius ρ(W) by distributed power iteration (symmetric W). */
  def spectralRadius(g: SparseGraph, iters: Int = 25): Double = {
    var v = g.edges.select(col("src").as("node")).distinct
      .withColumn("v", lit(1.0))
    var lambda = 0.0
    for (_ <- 1 to iters) {
      val w = g.edges
        .join(v.withColumnRenamed("node", "__n"), col("dst") === col("__n"))
        .groupBy(col("src").as("node"))
        .agg(sum("v").as("v"))
      val wm = materialize(w)
      val norm = math.sqrt(wm.agg(sum(col("v") * col("v"))).first().getDouble(0))
      if (norm == 0.0) return 0.0
      lambda = norm
      v = materialize(wm.withColumn("v", col("v") / norm))
    }
    lambda
  }

  /** Explicit ℓ-th adjacency power as a (src, dst, cnt) path-count table.
    *
    * This is the *naive* evaluation strategy the paper warns against
    * (§4.6): the intermediate result densifies as ~d^(ℓ−1)·m entries. Kept
    * as the comparison arm of the factorized-summation experiment (T5).
    */
  def explicitPower(edges: DataFrame, l: Int): DataFrame = {
    require(l >= 1, "power must be >= 1")
    var p = edges.withColumn("cnt", lit(1.0))
    for (_ <- 2 to l) {
      p = materialize(
        p.join(
            edges.withColumnRenamed("src", "mid").withColumnRenamed("dst", "dst2"),
            col("dst") === col("mid"))
          .groupBy(col("src"), col("dst2").as("dst"))
          .agg(sum("cnt").as("cnt")))
    }
    p
  }

  /** Collect a long-format n×k matrix into a dense driver matrix — tests
    * and small-n reference checks only.
    */
  def collectDense(f: DataFrame, n: Int, k: Int): Dense = {
    val out = Dense.zeros(n, k).data
    f.collect().foreach { r =>
      out(r.getLong(0).toInt * k + r.getInt(1)) = r.getDouble(2)
    }
    new Dense(n, k, out)
  }

  /** Build a SparseGraph from an undirected edge list (one direction),
    * deduplicating, dropping self-loops and adding reverse edges.
    */
  def fromUndirected(spark: SparkSession, n: Long, undirected: DataFrame): SparseGraph = {
    val e = undirected.select(col("src").cast("long"), col("dst").cast("long"))
      .where(col("src") =!= col("dst"))
    val canon = e.select(
      least(col("src"), col("dst")).as("src"),
      greatest(col("src"), col("dst")).as("dst")
    ).distinct()
    val both = canon.unionByName(canon.select(col("dst").as("src"), col("src").as("dst")))
    SparseGraph(n, materialize(both))
  }
}
