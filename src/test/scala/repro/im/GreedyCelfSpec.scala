package repro.im

import repro.SparkSpec
import repro.core.CsrGraph
import repro.graph.{Generators, GraphOps}
import repro.weights.EdgeWeights

/** Greedy vs CELF equivalence, estimator agreement, lazy-evaluation wins. */
class GreedyCelfSpec extends SparkSpec {

  private val rngSeed = 101L
  private val trials = 60

  /** Small weighted test graph: (n, triples, CSR). */
  private def graph(ewm: String, n: Int = 80, p: Double = 0.06) = {
    val undirected = Generators.erdosRenyi(spark, n, p, seed = 91)
    val weighted = EdgeWeights(ewm, GraphOps.symmetrize(undirected), seed = 92)
    val triples = GraphOps.toTriples(weighted)
    (triples, CsrGraph.fromTriples(n, triples))
  }

  // ---- estimator agreement --------------------------------------------

  for (ewm <- EdgeWeights.All) {
    test(s"all σ̂ backends return identical values on $ewm weights") {
      val (triples, g) = graph(ewm)
      val backends: Seq[InfluenceEstimator] = Seq(
        new CsrEstimator(g, trials, rngSeed),
        new BoxedEstimator(g.n, triples, trials, rngSeed),
        new FullScanEstimator(g.n, triples, trials, rngSeed),
        new SparkEstimator(spark, g, trials, rngSeed),
      )
      for (seeds <- Seq(Seq(0), Seq(1, 2, 3), Seq(10, 40))) {
        val vals = backends.map(_.sigma(seeds))
        assert(vals.distinct.size == 1, s"seeds=$seeds vals=${backends.map(_.name).zip(vals)}")
      }
    }
  }

  test("LT estimators agree across backends too") {
    val (triples, g) = graph("WC")
    val a = new CsrEstimator(g, trials, rngSeed, lt = true).sigma(Seq(0, 5))
    val b = new BoxedEstimator(g.n, triples, trials, rngSeed, lt = true).sigma(Seq(0, 5))
    val c = new FullScanEstimator(g.n, triples, trials, rngSeed, lt = true).sigma(Seq(0, 5))
    val d = new SparkEstimator(spark, g, trials, rngSeed, lt = true).sigma(Seq(0, 5))
    assert(a == b && a == c && a == d)
  }

  test("σ̂ is monotone in the seed set (live-edge worlds)") {
    val (_, g) = graph("WC")
    val est = new CsrEstimator(g, trials, rngSeed)
    val s1 = est.sigma(Seq(0))
    val s2 = est.sigma(Seq(0, 1))
    val s3 = est.sigma(Seq(0, 1, 2))
    assert(s1 <= s2 && s2 <= s3)
  }

  test("σ̂ of k seeds is at least k and at most n") {
    val (_, g) = graph("TV")
    val est = new CsrEstimator(g, trials, rngSeed)
    val v = est.sigma(Seq(0, 1, 2, 3))
    assert(v >= 4.0 && v <= g.n)
  }

  test("σ̂ is submodular on sampled chains (live-edge coverage argument)") {
    val (_, g) = graph("WC")
    val est = new CsrEstimator(g, trials, rngSeed)
    // For S ⊆ T and v ∉ T: σ(S+v) − σ(S) ≥ σ(T+v) − σ(T).
    val rnd = new scala.util.Random(5)
    (0 until 20).foreach { _ =>
      val s = Seq(rnd.nextInt(g.n))
      val t = s :+ rnd.nextInt(g.n)
      val v = rnd.nextInt(g.n)
      if (!t.contains(v)) {
        val gainS = est.sigma(s :+ v) - est.sigma(s)
        val gainT = est.sigma(t :+ v) - est.sigma(t)
        assert(gainS >= gainT - 1e-9, s"submodularity violated at s=$s t=$t v=$v")
      }
    }
  }

  // ---- greedy ----------------------------------------------------------

  test("greedy on a 2-star graph picks the hubs first") {
    // hubs 0 and 5 each cover 4 leaves with certainty.
    val triples = (1 to 4).map(i => (0, i, 1.0)) ++ (6 to 9).map(i => (5, i, 1.0))
    val g = CsrGraph.fromTriples(10, triples)
    val est = new CsrEstimator(g, 10, rngSeed)
    val res = Greedy.run(est.sigma, 0 until 10, 2)
    assert(res.seeds.toSet == Set(0, 5))
    assert(res.sigmaValues.last == 10.0)
  }

  test("greedy evaluation count is k passes over shrinking candidates") {
    val (_, g) = graph("TV", n = 30, p = 0.1)
    val est = new CsrEstimator(g, 20, rngSeed)
    val res = Greedy.run(est.sigma, 0 until 30, 3)
    assert(res.evaluations == 30 + 29 + 28)
  }

  test("greedy sigma values are non-decreasing") {
    val (_, g) = graph("WC", n = 40)
    val est = new CsrEstimator(g, 30, rngSeed)
    val res = Greedy.run(est.sigma, 0 until 40, 5)
    res.sigmaValues.sliding(2).foreach(p => assert(p(0) <= p(1) + 1e-9))
  }

  test("greedy marginal gains are non-increasing (submodular σ̂)") {
    val (_, g) = graph("WC", n = 40)
    val est = new CsrEstimator(g, 30, rngSeed)
    val res = Greedy.run(est.sigma, 0 until 40, 5)
    res.gains.sliding(2).foreach(p => assert(p(0) >= p(1) - 1e-9, s"gains ${res.gains}"))
  }

  test("greedy rejects invalid budgets") {
    val (_, g) = graph("TV", n = 10, p = 0.2)
    val est = new CsrEstimator(g, 10, rngSeed)
    assertThrows[IllegalArgumentException](Greedy.run(est.sigma, 0 until 10, 0))
    assertThrows[IllegalArgumentException](Greedy.run(est.sigma, 0 until 10, 11))
  }

  // ---- CELF ------------------------------------------------------------

  for (ewm <- EdgeWeights.All) {
    test(s"CELF == Greedy seed sets and σ̂ values on $ewm weights (IC, submodular)") {
      val (_, g) = graph(ewm, n = 50, p = 0.08)
      val est = new CsrEstimator(g, 40, rngSeed)
      val gr = Greedy.run(est.sigma, 0 until 50, 4)
      val ce = Celf.run(est.sigma, 0 until 50, 4)
      assert(ce.seeds == gr.seeds, s"CELF ${ce.seeds} vs greedy ${gr.seeds}")
      ce.sigmaValues.zip(gr.sigmaValues).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
    }
  }

  test("CELF uses strictly fewer evaluations than greedy beyond round one") {
    val (_, g) = graph("WC", n = 60, p = 0.06)
    val est = new CsrEstimator(g, 40, rngSeed)
    val gr = Greedy.run(est.sigma, 0 until 60, 5)
    val ce = Celf.run(est.sigma, 0 until 60, 5)
    assert(ce.evaluations < gr.evaluations,
      s"CELF ${ce.evaluations} evals vs greedy ${gr.evaluations}")
    assert(ce.evaluations >= 60, "CELF must at least scan all candidates once")
  }

  test("CELF selects the exact hub set on the 2-star graph") {
    val triples = (1 to 4).map(i => (0, i, 1.0)) ++ (6 to 9).map(i => (5, i, 1.0))
    val g = CsrGraph.fromTriples(10, triples)
    val est = new CsrEstimator(g, 10, rngSeed)
    val res = Celf.run(est.sigma, 0 until 10, 2)
    assert(res.seeds.toSet == Set(0, 5))
    assert(res.completed)
  }

  test("CELF respects an expired time budget and reports DNF") {
    val (_, g) = graph("WC", n = 60, p = 0.06)
    val est = new CsrEstimator(g, 40, rngSeed)
    val res = Celf.run(est.sigma, 0 until 60, 5, timeBudgetMs = 0)
    assert(!res.completed)
    assert(res.seeds.size < 5)
  }

  test("CELF completes within a generous budget") {
    val (_, g) = graph("TV", n = 30, p = 0.1)
    val est = new CsrEstimator(g, 20, rngSeed)
    val res = Celf.run(est.sigma, 0 until 30, 3, timeBudgetMs = 600000)
    assert(res.completed && res.seeds.size == 3)
  }

  test("CELF rejects invalid budgets") {
    val (_, g) = graph("TV", n = 10, p = 0.2)
    val est = new CsrEstimator(g, 10, rngSeed)
    assertThrows[IllegalArgumentException](Celf.run(est.sigma, 0 until 10, 0))
  }

  test("CELF sigma values are consistent with direct evaluation of its seeds") {
    val (_, g) = graph("UR", n = 40, p = 0.08)
    val est = new CsrEstimator(g, 30, rngSeed)
    val res = Celf.run(est.sigma, 0 until 40, 3)
    res.seeds.indices.foreach { i =>
      val direct = est.sigma(res.seeds.take(i + 1))
      assert(math.abs(res.sigmaValues(i) - direct) < 1e-9,
        s"prefix ${i + 1}: reported ${res.sigmaValues(i)} direct $direct")
    }
  }

  test("ImResult gains reconstruct sigma deltas") {
    val r = ImResult(Vector(1, 2), Vector(3.0, 5.5), 10, 1, completed = true)
    assert(r.gains == Vector(3.0, 2.5))
  }

  test("estimators reject non-positive trial counts") {
    val (_, g) = graph("TV", n = 10, p = 0.2)
    assertThrows[IllegalArgumentException](new CsrEstimator(g, 0, rngSeed))
  }
}
