package repro.core

/** Outcome of one diffusion trial.
  *
  * @param activationStep per-node activation time: `-1` if never activated,
  *                       `0` for seeds, `t` for nodes activated at step t.
  * @param newPerStep     number of nodes newly activated at each step
  *                       (index 0 = seeds); length = number of steps run.
  */
final case class SimResult(activationStep: Array[Int], newPerStep: Array[Int]) {

  /** Total number of activated nodes (the quantity σ averages). */
  def totalActivated: Int = newPerStep.sum

  /** Set of activated node ids — for cross-implementation equality tests. */
  def activatedSet: Set[Int] =
    activationStep.zipWithIndex.collect { case (s, v) if s >= 0 => v }.toSet

  /** Cumulative activated count after each step (Figure 3's y-axis). */
  def cumulativePerStep: Array[Int] = newPerStep.scanLeft(0)(_ + _).tail
}
