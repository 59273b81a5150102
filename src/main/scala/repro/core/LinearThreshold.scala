package repro.core

/** Frontier-based linear-threshold simulator over a CSR graph.
  *
  * Each node v draws a threshold θ_v uniformly in [0,1) per trial (via the
  * counter-based RNG, so every implementation sees the same thresholds).
  * v activates once the summed weight of its *active* in-neighbors reaches
  * θ_v. Instead of re-scanning in-neighborhoods each step, we forward-push:
  * when u activates we add w(u,v) to an accumulator at each out-neighbor v,
  * and v activates the moment its accumulator crosses its threshold. This is
  * the same frontier discipline as IC (Observation 1): per-step work is
  * proportional to edges leaving newly activated nodes.
  *
  * Weights must satisfy Σ_{u in in(v)} w(u,v) <= 1 (see
  * [[repro.weights.EdgeWeights.normalizeForLT]]); the simulator itself does
  * not require it but the model is only well-defined under it.
  */
object LinearThreshold {

  /** Run one LT trial; parameters as in [[IndependentCascade.simulate]]. */
  def simulate(g: CsrGraph, seeds: Array[Int], trial: Long, seed: Long): SimResult = {
    val step = new Array[Int](g.n)
    java.util.Arrays.fill(step, -1)
    val acc = new Array[Double](g.n)
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
          if (step(v) < 0) {
            acc(v) += g.weights(e)
            if (acc(v) >= Rng.threshold(seed, trial, v)) {
              step(v) = t
              queue(hi) = v; hi += 1
            }
          }
          e += 1
        }
      }
      if (hi > frontierEnd) perStep += hi - frontierEnd
    }
    SimResult(step, perStep.toArray)
  }

  /** Number of nodes activated in one trial (bookkeeping-free hot path). */
  def activatedCount(g: CsrGraph, seeds: Array[Int], trial: Long, seed: Long): Int = {
    val visited = new Array[Boolean](g.n)
    val acc = new Array[Double](g.n)
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
        if (!visited(v)) {
          acc(v) += g.weights(e)
          if (acc(v) >= Rng.threshold(seed, trial, v)) {
            visited(v) = true
            queue(hi) = v; hi += 1
          }
        }
        e += 1
      }
    }
    hi
  }

  /** Mean activated count over `trials` threshold worlds (local σ̂).
    * Delegates to [[LtSimulator]] so state allocation amortizes over trials.
    */
  def meanInfluence(g: CsrGraph, seeds: Array[Int], trials: Int, seed: Long): Double =
    new LtSimulator(g, seed).meanInfluence(seeds, trials)
}
