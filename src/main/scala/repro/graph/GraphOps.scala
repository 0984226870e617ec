package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Relational (DataFrame / Catalyst) graph operators.
  *
  * These are the distributed-dataflow counterparts of [[CsrGraph]]: the
  * graph lives as an edge `DataFrame` and degree / transition / SpMV steps
  * are expressed as joins and aggregations, so they run through the Spark
  * SQL engine and are checkable against DuckDB SQL via `repro.Oracle`.
  *
  * Column conventions:
  *  - undirected edge list: `src: int, dst: int` with `src < dst`, one row
  *    per edge (the canonical form produced by `GraphGen.toEdgeDf`);
  *  - directed (symmetrized) edge list: `src, dst`, both directions;
  *  - vectors over V: `id: int, value: double`, missing ids mean 0.
  */
object GraphOps {

  /** Both directions of an undirected edge list (drops self-loops, dedups). */
  def symmetrize(edges: DataFrame): DataFrame = {
    val clean = edges.select(col("src").cast("int"), col("dst").cast("int"))
      .where(col("src") =!= col("dst"))
      .distinct()
    clean.unionAll(clean.select(col("dst").as("src"), col("src").as("dst"))).distinct()
  }

  /** Degree table `id, degree` from a symmetrized edge list. */
  def degrees(symEdges: DataFrame): DataFrame =
    symEdges.groupBy(col("src").as("id")).agg(count(lit(1)).cast("long").as("degree"))

  /** Transition edge table of `P = D⁻¹A`: rows `(src, dst, w)` where
    * `w = P(src, dst) = 1 / d(src)`; i.e. the weight of moving src -> dst.
    */
  def transitionEdges(symEdges: DataFrame): DataFrame = {
    val deg = degrees(symEdges)
    symEdges.join(deg, symEdges("src") === deg("id"))
      .select(symEdges("src"), symEdges("dst"), (lit(1.0) / col("degree")).as("w"))
  }

  /** One sparse matrix–vector step `y = P x` as SMM uses it
    * (Algorithm 2, `s* ← P s*`): `y(v) = Σ_u P(v,u) x(u)
    * = (1/d(v)) Σ_{u ~ v} x(u)`. With transition rows `(src, dst,
    * w = 1/d(src))`, that is a join of `x` on the `dst` side aggregated by
    * `src`. `x` has columns `id, value`; absent ids are 0.
    */
  def spmvStep(transEdges: DataFrame, x: DataFrame): DataFrame =
    transEdges.join(x, transEdges("dst") === x("id"))
      .select(transEdges("src").as("id"), (col("w") * col("value")).as("contrib"))
      .groupBy(col("id")).agg(sum(col("contrib")).as("value"))

  /** One-hot vector `e_v` as a DataFrame. */
  def oneHot(spark: SparkSession, v: Int): DataFrame = {
    import spark.implicits._
    Seq((v, 1.0)).toDF("id", "value")
  }

  /** Collects a vector DataFrame into a dense array of length `n`. */
  def toDense(n: Int, x: DataFrame): Array[Double] = {
    val out = new Array[Double](n)
    x.select(col("id").cast("int"), col("value").cast("double")).collect()
      .foreach(r => out(r.getInt(0)) = r.getDouble(1))
    out
  }
}
