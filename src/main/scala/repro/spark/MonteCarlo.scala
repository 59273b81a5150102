package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{CsrGraph, IcSimulator, IndependentCascade, LinearThreshold, LtSimulator}

/** Spark-distributed Monte-Carlo driver for the diffusion engines.
  *
  * This is the "parallelism" future-work direction of the paper realized at
  * the level the repro band asks for: trials (not the graph) are the
  * parallel axis. The CSR graph is broadcast once; `spark.range(trials)`
  * fans the trial indices across cores; every task runs the same
  * counter-based-RNG simulation it would run locally, so distributed results
  * are bit-identical to local ones. Aggregations (influence, heatmap counts,
  * activation curves) are DataFrame pipelines, oracle-checked in the tests.
  */
object MonteCarlo {

  /** Diffusion model selector. */
  sealed trait Model extends Serializable
  case object IC extends Model
  case object LT extends Model

  /** Per-trial activation rows: (trial, node, step) for every activated node.
    *
    * The long-form relation every downstream aggregate derives from —
    * the Spark analog of keeping raw simulation traces.
    */
  def activations(
      spark: SparkSession,
      g: CsrGraph,
      seeds: Array[Int],
      trials: Int,
      seed: Long,
      model: Model = IC,
  ): DataFrame = {
    require(trials > 0, "trials must be positive")
    import spark.implicits._
    val bg = spark.sparkContext.broadcast(g)
    val bSeeds = spark.sparkContext.broadcast(seeds)
    spark
      .range(trials)
      .as[Long]
      .mapPartitions { it =>
        val graph = bg.value
        val s = bSeeds.value
        it.flatMap { trial =>
          val res = model match {
            case IC => IndependentCascade.simulate(graph, s, trial, seed)
            case LT => LinearThreshold.simulate(graph, s, trial, seed)
          }
          res.activationStep.iterator.zipWithIndex.collect {
            case (st, node) if st >= 0 => (trial, node, st)
          }
        }
      }
      .toDF("trial", "node", "step")
  }

  /** Per-trial activated-node counts: (trial, activated). */
  def trialCounts(
      spark: SparkSession,
      g: CsrGraph,
      seeds: Array[Int],
      trials: Int,
      seed: Long,
      model: Model = IC,
  ): DataFrame = {
    require(trials > 0, "trials must be positive")
    import spark.implicits._
    val bg = spark.sparkContext.broadcast(g)
    val bSeeds = spark.sparkContext.broadcast(seeds)
    spark
      .range(trials)
      .as[Long]
      .mapPartitions { it =>
        // One reusable-state simulator per partition: allocation amortizes
        // over the partition's trials, matching the local hot path.
        val g = bg.value
        val s = bSeeds.value
        model match {
          case IC =>
            val sim = new IcSimulator(g, seed)
            it.map(trial => (trial, sim.activatedCount(s, trial)))
          case LT =>
            val sim = new LtSimulator(g, seed)
            it.map(trial => (trial, sim.activatedCount(s, trial)))
        }
      }
      .toDF("trial", "activated")
  }

  /** Distributed σ̂(S): mean activated count over `trials` worlds.
    * Bit-identical to the local mean because the RNG is counter-based.
    */
  def influence(
      spark: SparkSession,
      g: CsrGraph,
      seeds: Array[Int],
      trials: Int,
      seed: Long,
      model: Model = IC,
  ): Double =
    trialCounts(spark, g, seeds, trials, seed, model)
      .agg(sum(col("activated")).cast("double").as("s"))
      .head()
      .getDouble(0) / trials

  /** Heatmap data (paper Figure 2): how many trials activated each node.
    * Columns (node, activations); nodes never activated are absent.
    */
  def activationCounts(activations: DataFrame): DataFrame =
    activations.groupBy(col("node")).agg(count(lit(1)).as("activations"))

  /** Activation curve (paper Figure 3): mean cumulative activated nodes at
    * each step, averaged over all trials. Because activation counts only
    * ever grow, the mean cumulative at step s is simply
    * |{rows with step <= s}| / trials — a pure SQL window over the long-form
    * relation. Columns (step, mean_activated).
    */
  def stepCurve(activations: DataFrame, trials: Int): DataFrame = {
    require(trials > 0, "trials must be positive")
    activations
      .groupBy(col("step"))
      .agg(count(lit(1)).as("newly"))
      .select(
        col("step"),
        (sum(col("newly")).over(
          org.apache.spark.sql.expressions.Window.orderBy(col("step"))
        ) / trials).as("mean_activated"),
      )
  }
}
