package repro.baselines

import repro.SparkSpec
import repro.core.{CsrGraph, IndependentCascade, LinearThreshold}
import repro.graph.{Generators, GraphOps}
import repro.weights.EdgeWeights

/** The reproduction's backbone: all three implementation rungs of the
  * paper's ladder (CSR engine, boxed-frontier "pure Python", full-scan
  * "NDlib") observe the same counter-based random worlds, so they must
  * produce *bit-identical* cascades — activated sets AND activation steps —
  * on every graph, edge-weight model, seed set, and trial.
  *
  * Tests are generated per (graph × EWM × model) cell; each cell checks
  * multiple trials and seed sets.
  */
class CrossImplSpec extends SparkSpec {

  /** (name, n, undirected edges) — small versions of the paper's graphs. */
  private lazy val graphs = Seq(
    ("ER", 120, Generators.erdosRenyi(spark, 120, 0.05, seed = 41)),
    ("WS", 120, Generators.wattsStrogatz(spark, 120, 6, 0.15, seed = 42)),
    ("CL", 150, Generators.chungLuPowerLaw(spark, 150, 500, 0.66, seed = 43)),
    ("REG", 100, Generators.randomRegular(spark, 100, 7, seed = 44)),
  )

  private def cell(n: Int, undirected: org.apache.spark.sql.DataFrame, ewm: String) = {
    val directed = GraphOps.symmetrize(undirected)
    val weighted =
      if (ewm == "WC") EdgeWeights.weightedCascade(directed)
      else EdgeWeights.normalizeForLT(EdgeWeights(ewm, directed, seed = 51))
    val triples = GraphOps.toTriples(weighted)
    (CsrGraph.fromTriples(n, triples),
      BoxedFrontier.buildAdjacency(triples),
      FullScan.buildAdjacency(triples),
      triples)
  }

  private val rngSeed = 97L

  for ((gName, n, undirectedLazy) <- graphs; ewm <- EdgeWeights.All) {

    test(s"IC: CSR == boxed-frontier == full-scan on $gName/$ewm (5 trials, 2 seed sets)") {
      val (g, boxed, scan, _) = cell(n, undirectedLazy, ewm)
      for {
        seeds <- Seq(Array(0), Array(1, 7, 13))
        trial <- 0 until 5
      } {
        val a = IndependentCascade.simulate(g, seeds, trial.toLong, rngSeed)
        val b = BoxedFrontier.simulateIC(n, boxed, seeds.toSeq, trial.toLong, rngSeed)
        val c = FullScan.simulateIC(n, scan, seeds.toSeq, trial.toLong, rngSeed)
        assert(a.activationStep.toSeq == b.activationStep.toSeq,
          s"CSR vs boxed mismatch at trial $trial seeds ${seeds.mkString(",")}")
        assert(a.activationStep.toSeq == c.activationStep.toSeq,
          s"CSR vs full-scan mismatch at trial $trial seeds ${seeds.mkString(",")}")
      }
    }

    test(s"LT: CSR == boxed-frontier == full-scan on $gName/$ewm (5 trials, 2 seed sets)") {
      val (g, boxed, scan, _) = cell(n, undirectedLazy, ewm)
      for {
        seeds <- Seq(Array(0), Array(2, 5, 11))
        trial <- 0 until 5
      } {
        val a = LinearThreshold.simulate(g, seeds, trial.toLong, rngSeed)
        val b = BoxedFrontier.simulateLT(n, boxed, seeds.toSeq, trial.toLong, rngSeed)
        val c = FullScan.simulateLT(n, scan, seeds.toSeq, trial.toLong, rngSeed)
        assert(a.activationStep.toSeq == b.activationStep.toSeq,
          s"CSR vs boxed mismatch at trial $trial")
        assert(a.activationStep.toSeq == c.activationStep.toSeq,
          s"CSR vs full-scan mismatch at trial $trial")
      }
    }

    test(s"baseline count paths match their trace paths on $gName/$ewm") {
      val (g, boxed, scan, _) = cell(n, undirectedLazy, ewm)
      for (trial <- 0 until 5) {
        val seeds = Seq(0, 9)
        assert(BoxedFrontier.activatedCountIC(boxed, seeds, trial.toLong, rngSeed) ==
          BoxedFrontier.simulateIC(n, boxed, seeds, trial.toLong, rngSeed).totalActivated)
        assert(BoxedFrontier.activatedCountLT(boxed, seeds, trial.toLong, rngSeed) ==
          BoxedFrontier.simulateLT(n, boxed, seeds, trial.toLong, rngSeed).totalActivated)
        assert(FullScan.activatedCountIC(n, scan, seeds, trial.toLong, rngSeed) ==
          FullScan.simulateIC(n, scan, seeds, trial.toLong, rngSeed).totalActivated)
        assert(FullScan.activatedCountLT(n, scan, seeds, trial.toLong, rngSeed) ==
          FullScan.simulateLT(n, scan, seeds, trial.toLong, rngSeed).totalActivated)
      }
    }

    test(s"IC mean influence agrees across implementations on $gName/$ewm") {
      val (g, boxed, scan, _) = cell(n, undirectedLazy, ewm)
      val seeds = Array(0, 3)
      val trials = 30
      val csr = IndependentCascade.meanInfluence(g, seeds, trials, rngSeed)
      val boxedMean = (0 until trials)
        .map(t => BoxedFrontier.simulateIC(n, boxed, seeds.toSeq, t.toLong, rngSeed).totalActivated)
        .sum.toDouble / trials
      val scanMean = (0 until trials)
        .map(t => FullScan.simulateIC(n, scan, seeds.toSeq, t.toLong, rngSeed).totalActivated)
        .sum.toDouble / trials
      assert(csr == boxedMean && csr == scanMean)
    }
  }

  // Edge cases shared by all implementations --------------------------------

  test("all IC implementations agree on a graph with isolated nodes") {
    val triples = Seq((0, 1, 0.8), (1, 2, 0.8)) // nodes 3, 4 isolated
    val g = CsrGraph.fromTriples(5, triples)
    val boxed = BoxedFrontier.buildAdjacency(triples)
    val scan = FullScan.buildAdjacency(triples)
    (0 until 10).foreach { t =>
      val a = IndependentCascade.simulate(g, Array(0), t.toLong, 3)
      val b = BoxedFrontier.simulateIC(5, boxed, Seq(0), t.toLong, 3)
      val c = FullScan.simulateIC(5, scan, Seq(0), t.toLong, 3)
      assert(a.activationStep.toSeq == b.activationStep.toSeq)
      assert(a.activationStep.toSeq == c.activationStep.toSeq)
    }
  }

  test("all LT implementations agree on a diamond with competing paths") {
    // 0 → {1,2} → 3: node 3's accumulator may need both in-neighbors.
    val triples = Seq((0, 1, 0.9), (0, 2, 0.9), (1, 3, 0.5), (2, 3, 0.5))
    val g = CsrGraph.fromTriples(4, triples)
    val boxed = BoxedFrontier.buildAdjacency(triples)
    val scan = FullScan.buildAdjacency(triples)
    (0 until 20).foreach { t =>
      val a = LinearThreshold.simulate(g, Array(0), t.toLong, 5)
      val b = BoxedFrontier.simulateLT(4, boxed, Seq(0), t.toLong, 5)
      val c = FullScan.simulateLT(4, scan, Seq(0), t.toLong, 5)
      assert(a.activationStep.toSeq == b.activationStep.toSeq, s"trial $t")
      assert(a.activationStep.toSeq == c.activationStep.toSeq, s"trial $t")
    }
  }

  test("all IC implementations agree when the seed set is the whole graph") {
    val triples = Seq((0, 1, 0.5), (1, 2, 0.5), (2, 0, 0.5))
    val g = CsrGraph.fromTriples(3, triples)
    val boxed = BoxedFrontier.buildAdjacency(triples)
    val scan = FullScan.buildAdjacency(triples)
    val all = Seq(0, 1, 2)
    val a = IndependentCascade.simulate(g, all.toArray, 0, 3)
    val b = BoxedFrontier.simulateIC(3, boxed, all, 0, 3)
    val c = FullScan.simulateIC(3, scan, all, 0, 3)
    assert(a.totalActivated == 3 && b.totalActivated == 3 && c.totalActivated == 3)
    assert(a.newPerStep.toSeq == Seq(3))
    assert(b.newPerStep.toSeq == Seq(3))
    assert(c.newPerStep.toSeq == Seq(3))
  }

  test("baseline adjacency builders preserve the edge multiset") {
    val triples = Seq((0, 1, 0.1), (0, 2, 0.2), (2, 1, 0.3))
    val boxed = BoxedFrontier.buildAdjacency(triples)
    val scan = FullScan.buildAdjacency(triples)
    assert(boxed(0).toSet == Set((1, 0.1), (2, 0.2)))
    assert(boxed(2).toSet == Set((1, 0.3)))
    assert(scan(0).toSet == Set((1, 0.1), (2, 0.2)))
    assert(scan(2).toSet == Set((1, 0.3)))
  }
}
