package repro.im

/** Result of an influence-maximization run.
  *
  * @param seeds       selected seed nodes, in selection order
  * @param sigmaValues σ̂ of the seed prefix after each selection
  * @param evaluations number of σ̂ evaluations performed
  * @param elapsedMs   wall-clock duration of the run
  * @param completed   false if a time budget expired before k seeds were
  *                    chosen (the paper's "did not finish" case)
  */
final case class ImResult(
    seeds: Vector[Int],
    sigmaValues: Vector[Double],
    evaluations: Long,
    elapsedMs: Long,
    completed: Boolean,
) {
  /** Marginal gain realized by each selection. */
  def gains: Vector[Double] =
    sigmaValues.zip(0.0 +: sigmaValues.dropRight(1)).map { case (cur, prev) => cur - prev }
}

/** Plain greedy hill-climbing for influence maximization (Kempe et al. 2003,
  * via Nemhauser et al. 1978): k rounds, each re-evaluating the marginal gain
  * of *every* remaining candidate. The (1 - 1/e)-approximation baseline CELF
  * optimizes; kept for the CELF == Greedy equivalence tests.
  */
object Greedy {

  /** Select k seeds maximizing σ̂ greedily.
    *
    * @param sigma      influence function (typically an [[InfluenceEstimator]])
    * @param candidates candidate node ids
    * @param k          seed budget
    */
  def run(sigma: Seq[Int] => Double, candidates: Seq[Int], k: Int): ImResult = {
    require(k > 0 && k <= candidates.distinct.size, s"need 0 < k <= |candidates|, got k=$k")
    val start = System.nanoTime()
    var evals = 0L
    var chosen = Vector.empty[Int]
    var sigmas = Vector.empty[Double]
    var current = 0.0
    var remaining = candidates.distinct.toVector
    while (chosen.size < k) {
      var bestNode = -1
      var bestSigma = Double.NegativeInfinity
      for (v <- remaining) {
        val s = sigma(chosen :+ v)
        evals += 1
        // Ties broken by first (lowest-index) candidate — CELF matches this.
        if (s > bestSigma) { bestSigma = s; bestNode = v }
      }
      chosen :+= bestNode
      sigmas :+= bestSigma
      current = bestSigma
      remaining = remaining.filterNot(_ == bestNode)
    }
    ImResult(chosen, sigmas, evals, (System.nanoTime() - start) / 1000000L, completed = true)
  }
}
