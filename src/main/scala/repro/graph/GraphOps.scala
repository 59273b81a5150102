package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** DataFrame-level operations on edge lists.
  *
  * An edge DataFrame has columns `src: Int, dst: Int` (directed) and
  * optionally `weight: Double`. These transforms are the Catalyst-side graph
  * utilities; each has SQL semantics and is validated against DuckDB in the
  * test suite.
  */
object GraphOps {

  /** Undirected → directed: emit both orientations of every edge, dedup.
    *
    * The paper's convention: "undirected edges in the graph were treated as
    * two directed edges".
    */
  def symmetrize(edges: DataFrame): DataFrame = {
    val fwd = edges.select(col("src"), col("dst"))
    val rev = edges.select(col("dst").as("src"), col("src").as("dst"))
    fwd.union(rev).distinct()
  }

  /** Drop duplicate (src, dst) pairs and self-loops. */
  def canonicalize(edges: DataFrame): DataFrame =
    edges.select("src", "dst").where(col("src") =!= col("dst")).distinct()

  /** In-degree per node appearing as a dst: columns (node, in_degree). */
  def inDegrees(edges: DataFrame): DataFrame =
    edges.groupBy(col("dst").as("node")).agg(count(lit(1)).as("in_degree"))

  /** Out-degree per node appearing as a src: columns (node, out_degree). */
  def outDegrees(edges: DataFrame): DataFrame =
    edges.groupBy(col("src").as("node")).agg(count(lit(1)).as("out_degree"))

  /** Collect a (possibly weighted) edge DataFrame to local triples; a
    * missing weight column defaults to `defaultWeight`.
    */
  def toTriples(edges: DataFrame, defaultWeight: Double = 1.0): Seq[(Int, Int, Double)] = {
    val withW =
      if (edges.columns.contains("weight")) edges.selectExpr("src", "dst", "cast(weight as double) weight")
      else edges.select(col("src"), col("dst"), lit(defaultWeight).as("weight"))
    withW.collect().map(r => (r.getInt(0), r.getInt(1), r.getDouble(2))).toSeq
  }

  /** Lift local triples into an edge DataFrame (tests, small graphs). */
  def fromTriples(spark: SparkSession, triples: Seq[(Int, Int, Double)]): DataFrame = {
    import spark.implicits._
    triples.toDF("src", "dst", "weight")
  }
}
