package repro.core

/** Frontier-based independent-cascade simulator over a CSR graph — the
  * reproduction of the paper's core engine.
  *
  * Implements Observation 1: a node activated at time t must have an
  * in-neighbor activated at t-1, so each step only scans the out-edges of the
  * previous step's newly-activated frontier (BFS order). Work is proportional
  * to edges incident to activated nodes, not to the size of the graph —
  * the property that makes CELF's many tiny cascades cheap.
  *
  * All state is primitive arrays: an `Array[Int]` activation-step vector
  * doubling as the visited set, and a flat int-array queue. No boxing, no
  * hashing — the JVM analog of the Cython implementation.
  */
object IndependentCascade {

  /** Run one IC trial.
    *
    * @param g     CSR graph; `g.weights(i)` is the activation probability of
    *              edge (src, targets(i))
    * @param seeds initially active nodes (deduplicated ids in [0, g.n))
    * @param trial trial index — selects the live-edge world
    * @param seed  experiment-level RNG seed
    */
  def simulate(g: CsrGraph, seeds: Array[Int], trial: Long, seed: Long): SimResult = {
    val step = new Array[Int](g.n)
    java.util.Arrays.fill(step, -1)
    // Queue holds the current frontier in [lo, hi); the next frontier is
    // appended after hi. Capacity n suffices: each node enters at most once.
    val queue = new Array[Int](g.n)
    var hi = 0
    var i = 0
    while (i < seeds.length) {
      val s = seeds(i)
      if (step(s) < 0) { step(s) = 0; queue(hi) = s; hi += 1 }
      i += 1
    }
    val perStep = scala.collection.mutable.ArrayBuffer[Int](hi)
    var lo = 0
    var t = 0
    while (lo < hi) {
      val frontierEnd = hi
      t += 1
      while (lo < frontierEnd) {
        val u = queue(lo); lo += 1
        var e = g.offsets(u)
        val end = g.offsets(u + 1)
        while (e < end) {
          val v = g.targets(e)
          if (step(v) < 0 && Rng.coin(seed, trial, u, v) < g.weights(e)) {
            step(v) = t
            queue(hi) = v; hi += 1
          }
          e += 1
        }
      }
      if (hi > frontierEnd) perStep += hi - frontierEnd
    }
    SimResult(step, perStep.toArray)
  }

  /** Number of nodes activated in one trial — the hot path for σ estimation.
    *
    * Identical traversal to [[simulate]] but skips per-step bookkeeping;
    * used by the influence estimators where only |activated| matters.
    */
  def activatedCount(g: CsrGraph, seeds: Array[Int], trial: Long, seed: Long): Int = {
    val visited = new Array[Boolean](g.n)
    val queue = new Array[Int](g.n)
    var hi = 0
    var i = 0
    while (i < seeds.length) {
      val s = seeds(i)
      if (!visited(s)) { visited(s) = true; queue(hi) = s; hi += 1 }
      i += 1
    }
    var lo = 0
    while (lo < hi) {
      val u = queue(lo); lo += 1
      var e = g.offsets(u)
      val end = g.offsets(u + 1)
      while (e < end) {
        val v = g.targets(e)
        if (!visited(v) && Rng.coin(seed, trial, u, v) < g.weights(e)) {
          visited(v) = true
          queue(hi) = v; hi += 1
        }
        e += 1
      }
    }
    hi
  }

  /** Mean activated count over `trials` live-edge worlds (local σ̂).
    * Delegates to [[IcSimulator]] so state allocation amortizes over trials.
    */
  def meanInfluence(g: CsrGraph, seeds: Array[Int], trials: Int, seed: Long): Double =
    new IcSimulator(g, seed).meanInfluence(seeds, trials)
}
