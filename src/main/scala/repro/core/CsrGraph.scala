package repro.core

import org.apache.spark.sql.DataFrame

/** Compressed-sparse-row directed graph with per-edge weights.
  *
  * This is the data-structure contribution of the paper mapped onto the JVM:
  * out-neighbors of every node stored contiguously in primitive arrays (no
  * boxing, no pointer chasing), with `offsets(v) until offsets(v+1)` indexing
  * the slice of `targets`/`weights` belonging to node `v`. Immutable once
  * built — ideal for the repeated traversals diffusion simulation performs.
  *
  * @param n       number of nodes; node ids are 0 until n
  * @param offsets length n+1; CSR row pointers into `targets`/`weights`
  * @param targets length m; out-neighbor ids, sorted within each row
  * @param weights length m; `weights(i)` is p(src, targets(i))
  */
final class CsrGraph(
    val n: Int,
    val offsets: Array[Int],
    val targets: Array[Int],
    val weights: Array[Double],
) extends Serializable {
  require(offsets.length == n + 1, s"offsets length ${offsets.length} != n+1 ${n + 1}")
  require(offsets(0) == 0, "offsets must start at 0")
  require(offsets(n) == targets.length, "offsets must end at edge count")
  require(targets.length == weights.length, "targets/weights length mismatch")

  /** Number of directed edges. */
  def m: Int = targets.length

  /** Out-degree of node v. */
  @inline def outDegree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** In-degrees of all nodes (single pass over the edge array). */
  def inDegrees: Array[Int] = {
    val d = new Array[Int](n)
    var i = 0
    while (i < targets.length) { d(targets(i)) += 1; i += 1 }
    d
  }

  /** Sum of incoming edge weights per node (LT feasibility: must be <= 1). */
  def inWeightSums: Array[Double] = {
    val s = new Array[Double](n)
    var i = 0
    while (i < targets.length) { s(targets(i)) += weights(i); i += 1 }
    s
  }

  /** Edges as (src, dst, weight) triples — for tests and cross-builds. */
  def edgeTriples: IndexedSeq[(Int, Int, Double)] =
    for {
      u <- 0 until n
      i <- offsets(u) until offsets(u + 1)
    } yield (u, targets(i), weights(i))

  /** Graph with every weight replaced by `f(src, dst, w)`; same structure. */
  def mapWeights(f: (Int, Int, Double) => Double): CsrGraph = {
    val w2 = new Array[Double](m)
    var u = 0
    while (u < n) {
      var i = offsets(u)
      while (i < offsets(u + 1)) { w2(i) = f(u, targets(i), weights(i)); i += 1 }
      u += 1
    }
    new CsrGraph(n, offsets, targets, w2)
  }
}

object CsrGraph {

  /** Build from (src, dst, weight) triples. Deduplicates exact duplicate
    * (src, dst) pairs keeping the first weight; sorts rows by target.
    *
    * @param n       node count (ids must lie in [0, n))
    * @param triples directed, weighted edges
    */
  def fromTriples(n: Int, triples: Seq[(Int, Int, Double)]): CsrGraph = {
    val seen = new java.util.HashSet[Long]()
    val uniq = triples.filter { case (u, v, _) =>
      require(u >= 0 && u < n && v >= 0 && v < n, s"edge ($u,$v) out of range [0,$n)")
      seen.add((u.toLong << 32) | (v.toLong & 0xffffffffL))
    }
    val sorted = uniq.sortBy { case (u, v, _) => (u, v) }
    val m = sorted.length
    val offsets = new Array[Int](n + 1)
    val targets = new Array[Int](m)
    val weights = new Array[Double](m)
    var i = 0
    for ((u, v, w) <- sorted) {
      offsets(u + 1) += 1
      targets(i) = v
      weights(i) = w
      i += 1
    }
    var v = 0
    while (v < n) { offsets(v + 1) += offsets(v); v += 1 }
    new CsrGraph(n, offsets, targets, weights)
  }

  /** Build from a weighted edge DataFrame with columns (src, dst, weight).
    *
    * Mirrors the paper's NetworkX→CSR conversion utilities: the DataFrame is
    * the "high-level" graph object, the CSR is the simulation structure.
    * Collects to the driver — diffusion graphs here are single-machine scale
    * by design (the paper's setting).
    */
  def fromDataFrame(edges: DataFrame, n: Int): CsrGraph = {
    val triples = edges
      .selectExpr("cast(src as int) src", "cast(dst as int) dst", "cast(weight as double) weight")
      .collect()
      .map(r => (r.getInt(0), r.getInt(1), r.getDouble(2)))
      .toSeq
    fromTriples(n, triples)
  }
}
