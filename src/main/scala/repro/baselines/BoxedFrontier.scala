package repro.baselines

import repro.core.{Rng, SimResult}
import scala.collection.mutable

/** The "fast pure Python" rung of the paper's ladder: the *same* frontier
  * algorithm as the CSR engine, but over idiomatic high-level collections —
  * an immutable `Map[Int, Vector[(Int, Double)]]` adjacency (boxed tuples,
  * pointer-chasing) and hash-based status sets. The algorithmic work is
  * identical to [[repro.core.IndependentCascade]]; only the constant factors
  * differ, which is exactly the CyNetDiff-vs-pure-Python comparison.
  */
object BoxedFrontier {

  /** Adjacency map from directed (src, dst, weight) triples. */
  def buildAdjacency(triples: Seq[(Int, Int, Double)]): Map[Int, Vector[(Int, Double)]] =
    triples.groupBy(_._1).map { case (u, es) =>
      u -> es.sortBy(_._2).map { case (_, v, w) => (v, w) }.toVector
    }

  /** One IC trial; same random world as the CSR engine (identical output). */
  def simulateIC(
      n: Int,
      adj: Map[Int, Vector[(Int, Double)]],
      seeds: Seq[Int],
      trial: Long,
      seed: Long,
  ): SimResult = {
    val step = mutable.Map.empty[Int, Int]
    var frontier = seeds.distinct.toVector
    frontier.foreach(s => step(s) = 0)
    val perStep = mutable.ArrayBuffer[Int](frontier.size)
    var t = 0
    while (frontier.nonEmpty) {
      t += 1
      val next = mutable.ArrayBuffer.empty[Int]
      for {
        u <- frontier
        (v, w) <- adj.getOrElse(u, Vector.empty)
        if !step.contains(v) && Rng.coin(seed, trial, u, v) < w
      } {
        step(v) = t
        next += v
      }
      if (next.nonEmpty) perStep += next.size
      frontier = next.toVector
    }
    toResult(n, step, perStep)
  }

  /** One LT trial; forward-push accumulation, same thresholds as CSR. */
  def simulateLT(
      n: Int,
      adj: Map[Int, Vector[(Int, Double)]],
      seeds: Seq[Int],
      trial: Long,
      seed: Long,
  ): SimResult = {
    val step = mutable.Map.empty[Int, Int]
    val acc = mutable.Map.empty[Int, Double].withDefaultValue(0.0)
    var frontier = seeds.distinct.toVector
    frontier.foreach(s => step(s) = 0)
    val perStep = mutable.ArrayBuffer[Int](frontier.size)
    var t = 0
    while (frontier.nonEmpty) {
      t += 1
      val next = mutable.ArrayBuffer.empty[Int]
      for {
        u <- frontier
        (v, w) <- adj.getOrElse(u, Vector.empty)
        if !step.contains(v)
      } {
        acc(v) = acc(v) + w
        if (acc(v) >= Rng.threshold(seed, trial, v)) {
          step(v) = t
          next += v
        }
      }
      if (next.nonEmpty) perStep += next.size
      frontier = next.toVector
    }
    toResult(n, step, perStep)
  }

  /** Activated-node count for one IC trial — the σ̂ hot path. Same frontier
    * loop as [[simulateIC]] without per-step bookkeeping or the O(n) result
    * array; the "pure Python" CELF backend computes `len(activated)`.
    */
  def activatedCountIC(
      adj: Map[Int, Vector[(Int, Double)]],
      seeds: Seq[Int],
      trial: Long,
      seed: Long,
  ): Int = {
    val active = mutable.HashSet.empty[Int]
    var frontier = seeds.distinct.toVector
    frontier.foreach(active += _)
    while (frontier.nonEmpty) {
      val next = mutable.ArrayBuffer.empty[Int]
      for {
        u <- frontier
        (v, w) <- adj.getOrElse(u, Vector.empty)
        if !active.contains(v) && Rng.coin(seed, trial, u, v) < w
      } {
        active += v
        next += v
      }
      frontier = next.toVector
    }
    active.size
  }

  /** Activated-node count for one LT trial (see [[activatedCountIC]]). */
  def activatedCountLT(
      adj: Map[Int, Vector[(Int, Double)]],
      seeds: Seq[Int],
      trial: Long,
      seed: Long,
  ): Int = {
    val active = mutable.HashSet.empty[Int]
    val acc = mutable.Map.empty[Int, Double].withDefaultValue(0.0)
    var frontier = seeds.distinct.toVector
    frontier.foreach(active += _)
    while (frontier.nonEmpty) {
      val next = mutable.ArrayBuffer.empty[Int]
      for {
        u <- frontier
        (v, w) <- adj.getOrElse(u, Vector.empty)
        if !active.contains(v)
      } {
        acc(v) = acc(v) + w
        if (acc(v) >= Rng.threshold(seed, trial, v)) {
          active += v
          next += v
        }
      }
      frontier = next.toVector
    }
    active.size
  }

  private def toResult(n: Int, step: mutable.Map[Int, Int], perStep: mutable.ArrayBuffer[Int]): SimResult = {
    val arr = Array.fill(n)(-1)
    step.foreach { case (v, s) => arr(v) = s }
    SimResult(arr, perStep.toArray)
  }
}
