package repro.spark

import org.apache.spark.sql.functions._
import repro.core.{CsrGraph, IndependentCascade, LinearThreshold}
import repro.graph.{Generators, GraphOps}
import repro.weights.EdgeWeights
import repro.{Oracle, SparkSpec}

/** Distributed Monte-Carlo vs local engines, plus oracle-checked aggregates. */
class MonteCarloSpec extends SparkSpec {

  private lazy val g: CsrGraph = {
    val undirected = Generators.erdosRenyi(spark, 150, 0.04, seed = 61)
    val weighted = EdgeWeights.weightedCascade(GraphOps.symmetrize(undirected))
    CsrGraph.fromDataFrame(weighted, 150)
  }
  private val seeds = Array(0, 5, 9)
  private val rngSeed = 71L

  test("distributed IC influence is bit-identical to the local mean") {
    val local = IndependentCascade.meanInfluence(g, seeds, 40, rngSeed)
    val dist = MonteCarlo.influence(spark, g, seeds, 40, rngSeed, MonteCarlo.IC)
    assert(local == dist, s"local=$local dist=$dist")
  }

  test("distributed LT influence is bit-identical to the local mean") {
    val local = LinearThreshold.meanInfluence(g, seeds, 40, rngSeed)
    val dist = MonteCarlo.influence(spark, g, seeds, 40, rngSeed, MonteCarlo.LT)
    assert(local == dist)
  }

  test("trialCounts rows match local per-trial counts exactly") {
    val rows = MonteCarlo.trialCounts(spark, g, seeds, 25, rngSeed, MonteCarlo.IC)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    assert(rows.size == 25)
    (0 until 25).foreach { t =>
      assert(rows(t.toLong) == IndependentCascade.activatedCount(g, seeds, t.toLong, rngSeed))
    }
  }

  test("activations long-form matches local simulation traces") {
    val rows = MonteCarlo.activations(spark, g, seeds, 10, rngSeed, MonteCarlo.IC)
      .collect().map(r => (r.getLong(0), r.getInt(1)) -> r.getInt(2)).toMap
    (0 until 10).foreach { t =>
      val local = IndependentCascade.simulate(g, seeds, t.toLong, rngSeed)
      local.activationStep.zipWithIndex.foreach { case (s, v) =>
        if (s >= 0) assert(rows((t.toLong, v)) == s, s"trial $t node $v")
        else assert(!rows.contains((t.toLong, v)))
      }
    }
  }

  test("activations for LT match local simulation traces") {
    val rows = MonteCarlo.activations(spark, g, seeds, 8, rngSeed, MonteCarlo.LT)
      .collect().map(r => (r.getLong(0), r.getInt(1)) -> r.getInt(2)).toMap
    (0 until 8).foreach { t =>
      val local = LinearThreshold.simulate(g, seeds, t.toLong, rngSeed)
      local.activationStep.zipWithIndex.foreach { case (s, v) =>
        if (s >= 0) assert(rows((t.toLong, v)) == s)
        else assert(!rows.contains((t.toLong, v)))
      }
    }
  }

  test("every trial contains the seed rows at step 0") {
    val df = MonteCarlo.activations(spark, g, seeds, 12, rngSeed)
    val seedRows = df.where(col("step") === 0).collect()
      .map(r => (r.getLong(0), r.getInt(1))).toSet
    val expected = (for (t <- 0 until 12; s <- seeds) yield (t.toLong, s)).toSet
    assert(seedRows == expected)
  }

  test("activationCounts (heatmap) agrees with DuckDB group-by") {
    val acts = MonteCarlo.activations(spark, g, seeds, 15, rngSeed).persist()
    Oracle.assertEquivalent(
      MonteCarlo.activationCounts(acts),
      "SELECT node, count(*) as activations FROM a GROUP BY node",
      "a" -> acts,
    )
  }

  test("activationCounts: seeds are activated in every trial (heatmap hot spots)") {
    val acts = MonteCarlo.activations(spark, g, seeds, 15, rngSeed)
    val counts = MonteCarlo.activationCounts(acts).collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    seeds.foreach(s => assert(counts(s) == 15, s"seed $s activated ${counts.get(s)} times"))
  }

  test("activationCounts never exceeds the trial count") {
    val acts = MonteCarlo.activations(spark, g, seeds, 15, rngSeed)
    val max = MonteCarlo.activationCounts(acts).agg(org.apache.spark.sql.functions.max("activations"))
      .head().getLong(0)
    assert(max <= 15)
  }

  test("stepCurve agrees with DuckDB cumulative semantics") {
    val acts = MonteCarlo.activations(spark, g, seeds, 15, rngSeed).persist()
    Oracle.assertEquivalent(
      MonteCarlo.stepCurve(acts, 15),
      // step is VARCHAR inside the oracle table — cast before ordering so
      // the cumulative window runs in numeric, not lexicographic, order.
      "SELECT cast(step as int) as step, " +
        "sum(cnt) OVER (ORDER BY cast(step as int)) / 15.0 as mean_activated FROM " +
        "(SELECT step, count(*) as cnt FROM a GROUP BY step)",
      "a" -> acts,
    )
  }

  test("stepCurve starts at the seed count and is monotone (Figure 3 shape)") {
    val acts = MonteCarlo.activations(spark, g, seeds, 20, rngSeed)
    val curve = MonteCarlo.stepCurve(acts, 20).orderBy("step").collect().map(_.getDouble(1))
    assert(math.abs(curve.head - seeds.length) < 1e-9, s"curve starts at ${curve.head}")
    curve.sliding(2).foreach(p => assert(p(0) <= p(1), "mean activated must be monotone"))
  }

  test("stepCurve final value equals the influence estimate") {
    val acts = MonteCarlo.activations(spark, g, seeds, 20, rngSeed)
    val last = MonteCarlo.stepCurve(acts, 20).orderBy(desc("step")).head().getDouble(1)
    val sigma = MonteCarlo.influence(spark, g, seeds, 20, rngSeed)
    assert(math.abs(last - sigma) < 1e-9)
  }

  test("distributed results are independent of partitioning") {
    val a = MonteCarlo.trialCounts(spark, g, seeds, 30, rngSeed).repartition(2)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    val b = MonteCarlo.trialCounts(spark, g, seeds, 30, rngSeed).repartition(13)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    assert(a == b)
  }

  test("influence rejects non-positive trial counts") {
    assertThrows[IllegalArgumentException](MonteCarlo.influence(spark, g, seeds, 0, rngSeed))
  }

  test("stepCurve rejects non-positive trial counts") {
    val acts = MonteCarlo.activations(spark, g, seeds, 2, rngSeed)
    assertThrows[IllegalArgumentException](MonteCarlo.stepCurve(acts, 0))
  }
}
