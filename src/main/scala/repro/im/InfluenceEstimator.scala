package repro.im

import org.apache.spark.sql.SparkSession
import repro.baselines.{BoxedFrontier, FullScan}
import repro.core.{CsrGraph, IcSimulator, LtSimulator}
import repro.spark.MonteCarlo

/** Monte-Carlo influence function σ̂(S) with a pluggable simulation backend —
  * the "CELF with different backends" axis of the paper's Table 2.
  *
  * Every backend evaluates the *same* fixed set of live-edge/threshold
  * worlds (trials 0 until `trials` with the shared counter-based RNG), so:
  *   - all backends return bit-identical σ̂ for the same S (tested), and
  *   - for IC, σ̂ is an average of per-world reachability coverages, hence
  *     monotone submodular, making lazy (CELF) and full greedy provably
  *     pick identical seed sets.
  */
trait InfluenceEstimator {
  /** Backend name as it appears in benchmark output. */
  def name: String

  /** Estimated expected number of activated nodes for seed set `seeds`. */
  def sigma(seeds: Seq[Int]): Double
}

/** σ̂ via the CSR frontier engine (the CyNetDiff analog). Uses the
  * reusable-state simulators so per-evaluation cost is proportional to the
  * touched edges, not to graph size — the property Table 2 measures.
  */
final class CsrEstimator(g: CsrGraph, trials: Int, seed: Long, lt: Boolean = false)
    extends InfluenceEstimator {
  require(trials > 0, "trials must be positive")
  private val ic = if (lt) null else new IcSimulator(g, seed)
  private val ltSim = if (lt) new LtSimulator(g, seed) else null
  val name: String = "csr"
  def sigma(seeds: Seq[Int]): Double = {
    val arr = seeds.toArray
    if (lt) ltSim.meanInfluence(arr, trials) else ic.meanInfluence(arr, trials)
  }
}

/** σ̂ via the boxed-frontier baseline (the pure-Python analog). */
final class BoxedEstimator(n: Int, triples: Seq[(Int, Int, Double)], trials: Int, seed: Long, lt: Boolean = false)
    extends InfluenceEstimator {
  require(trials > 0, "trials must be positive")
  private val adj = BoxedFrontier.buildAdjacency(triples)
  val name: String = "boxed"
  def sigma(seeds: Seq[Int]): Double = {
    var sum = 0L
    var t = 0
    while (t < trials) {
      sum +=
        (if (lt) BoxedFrontier.activatedCountLT(adj, seeds, t.toLong, seed)
         else BoxedFrontier.activatedCountIC(adj, seeds, t.toLong, seed))
      t += 1
    }
    sum.toDouble / trials
  }
}

/** σ̂ via the full-scan baseline (the NDlib analog) — the backend the paper
  * reports as not finishing CELF within its time budget.
  */
final class FullScanEstimator(n: Int, triples: Seq[(Int, Int, Double)], trials: Int, seed: Long, lt: Boolean = false)
    extends InfluenceEstimator {
  require(trials > 0, "trials must be positive")
  private val adj = FullScan.buildAdjacency(triples)
  val name: String = "fullscan"
  def sigma(seeds: Seq[Int]): Double = {
    var sum = 0L
    var t = 0
    while (t < trials) {
      sum +=
        (if (lt) FullScan.activatedCountLT(n, adj, seeds, t.toLong, seed)
         else FullScan.activatedCountIC(n, adj, seeds, t.toLong, seed))
      t += 1
    }
    sum.toDouble / trials
  }
}

/** σ̂ with trials fanned out over the Spark cluster — same worlds, same
  * value, different execution substrate (see [[repro.spark.MonteCarlo]]).
  */
final class SparkEstimator(spark: SparkSession, g: CsrGraph, trials: Int, seed: Long, lt: Boolean = false)
    extends InfluenceEstimator {
  require(trials > 0, "trials must be positive")
  val name: String = "spark"
  def sigma(seeds: Seq[Int]): Double =
    MonteCarlo.influence(spark, g, seeds.toArray, trials, seed, if (lt) MonteCarlo.LT else MonteCarlo.IC)
}
