package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graphs.{GraphGen, GraphOps}

/** Behaviour of the reference GD implementation (Algorithm 1 + §3.2). */
class LocalGDSpec extends AnyFunSuite {

  private def wsFor(g: repro.graphs.LocalGraph, specs: Seq[String]) =
    Weights.localAll(g, specs)

  test("two cliques with a bridge: GD recovers the clique split") {
    val g = GraphGen.twoCliquesBridge(20)
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit)), GDConfig(eps = 0.05, seed = 1))
    // exactly one edge (the bridge) may be cut
    assert(res.locality >= (g.numEdges - 1).toDouble / g.numEdges)
    // sides are the cliques
    val side0 = (0 until 20).map(res.side).toSet
    val side1 = (20 until 40).map(res.side).toSet
    assert(side0.size == 1 && side1.size == 1 && side0 != side1)
  }

  // Randomized GD lands in a weaker basin for some noise draws (the paper's
  // algorithm has the same property); require every seed to beat hash
  // soundly and most seeds to recover the planted cut almost exactly.
  private lazy val plantedRuns: Seq[Double] = {
    val g = GraphGen.plantedBisection(100, 0.15, 0.01, seed = 11)
    (1L to 4L).map { seed =>
      LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit, Weights.Degree)),
        GDConfig(eps = 0.05, seed = seed)).locality
    }
  }

  for (i <- 0 until 4) {
    test(s"planted bisection: seed ${i + 1} beats hash soundly") {
      assert(plantedRuns(i) > 0.65, s"locality ${plantedRuns(i)}")
    }
  }

  test("planted bisection: the typical seed recovers the planted cut") {
    assert(plantedRuns.max > 0.88, s"best locality ${plantedRuns.max}")
    assert(plantedRuns.sorted.apply(2) > 0.85, s"runs $plantedRuns")
  }

  for (d <- 1 to 4) {
    test(s"balance holds for d=$d dimensions on an RMAT graph") {
      val g = GraphGen.rmatLocal(10, 8, seed = 77)
      val specs = Weights.All.take(d)
      val res = LocalGD.bipartition(g, wsFor(g, specs), GDConfig(eps = 0.03, seed = 5))
      res.imbalances.zip(specs).foreach { case (imb, s) =>
        assert(imb <= 0.03 + 0.02, s"dimension $s imbalance $imb exceeds eps+slack")
      }
    }
  }

  for (eps <- Seq(0.01, 0.05, 0.1)) {
    test(s"balance tracks the requested eps=$eps") {
      val g = GraphGen.rmatLocal(10, 8, seed = 78)
      val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit, Weights.Degree)),
        GDConfig(eps = eps, seed = 5))
      assert(res.imbalances.max <= eps + 0.02)
    }
  }

  test("larger eps yields at least comparable locality (more freedom)") {
    val g = GraphGen.rmatLocal(10, 8, seed = 79)
    val ws = wsFor(g, Seq(Weights.Unit, Weights.Degree))
    val tight = LocalGD.bipartition(g, ws, GDConfig(eps = 0.005, seed = 5)).locality
    val loose = LocalGD.bipartition(g, ws, GDConfig(eps = 0.2, seed = 5)).locality
    assert(loose >= tight - 0.05)
  }

  test("deterministic: same seed gives the same partition") {
    val g = GraphGen.rmatLocal(9, 6, seed = 80)
    val ws = wsFor(g, Seq(Weights.Unit))
    val a = LocalGD.bipartition(g, ws, GDConfig(seed = 9)).side
    val b = LocalGD.bipartition(g, ws, GDConfig(seed = 9)).side
    assert(a.toSeq == b.toSeq)
  }

  test("different seeds explore different solutions (noise matters)") {
    val g = GraphGen.rmatLocal(9, 6, seed = 80)
    val ws = wsFor(g, Seq(Weights.Unit))
    val a = LocalGD.bipartition(g, ws, GDConfig(seed = 9)).side
    val b = LocalGD.bipartition(g, ws, GDConfig(seed = 10)).side
    assert(a.toSeq != b.toSeq)
  }

  for (method <- Seq[ProjectionMethod](ProjectionMethod.OneShot,
    ProjectionMethod.FullAlternating, ProjectionMethod.Dykstra, ProjectionMethod.Exact)) {
    test(s"projection method $method produces a balanced, better-than-hash cut") {
      val g = GraphGen.plantedBisection(60, 0.2, 0.02, seed = 12)
      val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit, Weights.Degree)),
        GDConfig(eps = 0.05, projection = method, seed = 5))
      assert(res.imbalances.max <= 0.05 + 0.03, s"imb ${res.imbalances.toSeq}")
      val hash = repro.baselines.HashPartition.partition(g.n, 2)
      assert(res.locality > g.edgeLocality(hash))
    }
  }

  test("exact projection with d=3 is rejected") {
    val g = GraphGen.rmatLocal(8, 4)
    intercept[IllegalArgumentException] {
      LocalGD.bipartition(g, wsFor(g, Weights.All.take(3)),
        GDConfig(projection = ProjectionMethod.Exact))
    }
  }

  test("trace records one row per iteration with sane values") {
    val g = GraphGen.rmatLocal(8, 4, seed = 81)
    val cfg = GDConfig(iterations = 20, trace = true, seed = 5)
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit)), cfg)
    assert(res.trace.nonEmpty && res.trace.length <= 20)
    res.trace.foreach { r =>
      assert(r.locality >= 0 && r.locality <= 1)
      assert(r.maxImbalance >= 0 && r.maxImbalance <= 1)
    }
  }

  test("vertex fixing freezes vertices and preserves balance (Figure 9 claim)") {
    val g = GraphGen.liveJournalLiteLocal()
    val ws = wsFor(g, Seq(Weights.Unit, Weights.Degree))
    val withFix = LocalGD.bipartition(g, ws, GDConfig(eps = 0.03, vertexFixing = true, seed = 5))
    assert(withFix.imbalances.max <= 0.05)
    assert(withFix.locality > 0.5)
  }

  test("star graph: balance on degree forces the hub to be nearly alone") {
    val g = GraphGen.star(101) // hub degree 100, leaves degree 1; W_deg = 200
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Degree)), GDConfig(eps = 0.1, seed = 5))
    // hub side has deg weight >= 100 of total 200: balance means leaves split
    assert(res.imbalances.max <= 0.1 + 0.05)
  }

  test("empty-ish graph (no edges among n vertices) still terminates balanced") {
    val g = repro.graphs.LocalGraph.fromEdges(50, Array.empty)
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit)), GDConfig(eps = 0.05, seed = 5))
    assert(GraphOps.imbalanceLocal(res.side, Array.fill(50)(1.0), 2) <= 0.1)
  }

  test("path graph bipartition cuts few edges") {
    val g = GraphGen.path(200)
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit)), GDConfig(eps = 0.05, seed = 5))
    assert(res.locality >= 0.9, s"path locality ${res.locality}")
  }

  test("objective relation: locality equals uncut/total") {
    val g = GraphGen.rmatLocal(8, 4, seed = 82)
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit)), GDConfig(seed = 5))
    assert(math.abs(res.locality - g.uncutEdges(res.side).toDouble / g.numEdges) < 1e-12)
  }

  test("x is always inside the box at termination") {
    val g = GraphGen.rmatLocal(8, 4, seed = 83)
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit, Weights.Degree)), GDConfig(seed = 5))
    assert(res.x.forall(v => v >= -1.0 - 1e-9 && v <= 1.0 + 1e-9))
  }

  test("non-adaptive step still yields a valid partition") {
    val g = GraphGen.rmatLocal(9, 6, seed = 84)
    val res = LocalGD.bipartition(g, wsFor(g, Seq(Weights.Unit)),
      GDConfig(adaptiveStep = false, vertexFixing = false, seed = 5))
    assert(res.side.forall(s => s == 0 || s == 1))
    assert(res.imbalances.max <= 0.15)
  }
}
