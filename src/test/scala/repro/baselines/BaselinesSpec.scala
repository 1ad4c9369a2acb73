package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Weights
import repro.graphs.{GraphGen, GraphOps}

/** The reimplemented comparison systems (paper §4). */
class BaselinesSpec extends AnyFunSuite {

  // ---- Hash ----

  for (k <- Seq(2, 4, 16)) {
    test(s"hash: valid parts and near-uniform vertex counts (k=$k)") {
      val n = 20000
      val a = HashPartition.partition(n, k)
      assert(a.forall(p => p >= 0 && p < k))
      val imb = GraphOps.imbalanceLocal(a, Array.fill(n)(1.0), k)
      assert(imb < 0.05, s"hash vertex imbalance $imb")
    }
  }

  test("hash is deterministic in the seed") {
    assert(HashPartition.partition(100, 4, 7).toSeq == HashPartition.partition(100, 4, 7).toSeq)
    assert(HashPartition.partition(100, 4, 7).toSeq != HashPartition.partition(100, 4, 8).toSeq)
  }

  test("hash locality on an RMAT graph is near 1/k") {
    val g = GraphGen.rmatLocal(10, 8, seed = 3)
    for (k <- Seq(2, 4)) {
      val loc = g.edgeLocality(HashPartition.partition(g.n, k))
      assert(math.abs(loc - 1.0 / k) < 0.05, s"k=$k locality $loc")
    }
  }

  // ---- Spinner ----

  test("spinner: valid partition and edge-load balance within slack") {
    val g = GraphGen.rmatLocal(10, 8, seed = 5)
    val k = 4
    val a = Spinner.partition(g, k, SpinnerConfig(balanceSlack = 0.05))
    assert(a.forall(p => p >= 0 && p < k))
    val imb = GraphOps.imbalanceLocal(a, Weights.local(g, Weights.Degree), k)
    assert(imb <= 0.10, s"spinner edge imbalance $imb")
  }

  test("spinner beats hash on locality for a community graph") {
    val g = GraphGen.plantedKCommunities(4, 60, 0.2, 0.01, seed = 6)
    val a = Spinner.partition(g, 4)
    val h = HashPartition.partition(g.n, 4)
    assert(g.edgeLocality(a) > g.edgeLocality(h))
  }

  test("spinner does NOT control vertex balance on skewed graphs (Fig 4 premise)") {
    val g = GraphGen.twitterLiteLocal()
    val k = 8
    val a = Spinner.partition(g, k)
    val vImb = GraphOps.imbalanceLocal(a, Weights.local(g, Weights.Unit), k)
    val eImb = GraphOps.imbalanceLocal(a, Weights.local(g, Weights.Degree), k)
    // edge balance enforced, vertex balance materially worse
    assert(eImb <= 0.10, s"edge imbalance $eImb")
    assert(vImb > eImb, s"expected vertex imbalance ($vImb) > edge imbalance ($eImb)")
  }

  // ---- BLP ----

  // The paper runs BLP with c = 1024 clusters per part; our graphs afford
  // ~4-16 clusters per part, so balance granularity is proportionally
  // coarser — thresholds reflect that (DESIGN.md §4 / EXPERIMENTS.md).
  for (k <- Seq(2, 8)) {
    test(s"blp: valid partition with multi-dim balance from the merge (k=$k)") {
      val g = GraphGen.rmatLocal(12, 8, seed = 7)
      val a = BLP.partition(g, k, BLPConfig())
      assert(a.forall(p => p >= 0 && p < k))
      val vImb = GraphOps.imbalanceLocal(a, Weights.local(g, Weights.Unit), k)
      val eImb = GraphOps.imbalanceLocal(a, Weights.local(g, Weights.Degree), k)
      assert(vImb <= 0.25, s"blp vertex imbalance $vImb")
      assert(eImb <= 0.25, s"blp edge imbalance $eImb")
    }
  }

  test("blp beats hash on locality for a community graph") {
    val g = GraphGen.plantedKCommunities(8, 40, 0.25, 0.01, seed = 8)
    val a = BLP.partition(g, 2, BLPConfig(c = 16))
    val h = HashPartition.partition(g.n, 2)
    assert(g.edgeLocality(a) > g.edgeLocality(h))
  }

  test("blp is deterministic in the seed") {
    val g = GraphGen.rmatLocal(8, 4, seed = 9)
    assert(BLP.partition(g, 2).toSeq == BLP.partition(g, 2).toSeq)
  }

  // ---- SHP ----

  test("shp: valid partition, combined-weight balance preserved") {
    val g = GraphGen.rmatLocal(10, 8, seed = 10)
    val k = 4
    val cfgE = SHPConfig(edgeCoeff = 1.0, vertexCoeff = 0.1)
    val a = SHP.partition(g, k, cfgE)
    assert(a.forall(p => p >= 0 && p < k))
    val cw = Array.tabulate(g.n)(v => cfgE.edgeCoeff * g.degree(v) + cfgE.vertexCoeff)
    val imb = GraphOps.imbalanceLocal(a, cw, k)
    assert(imb <= 0.15, s"combined imbalance $imb")
  }

  test("shp improves locality over its initial balanced assignment") {
    val g = GraphGen.plantedKCommunities(4, 50, 0.25, 0.01, seed = 11)
    val a = SHP.partition(g, 4)
    val h = HashPartition.partition(g.n, 4)
    assert(g.edgeLocality(a) > g.edgeLocality(h))
  }

  test("shp balances the combination, not each dimension (Fig 4 premise)") {
    val g = GraphGen.twitterLiteLocal()
    val k = 8
    val cfgE = SHPConfig(edgeCoeff = 1.0, vertexCoeff = 0.1)
    val a = SHP.partition(g, k, cfgE)
    val cw = Array.tabulate(g.n)(v => cfgE.edgeCoeff * g.degree(v) + cfgE.vertexCoeff)
    val cImb = GraphOps.imbalanceLocal(a, cw, k)
    val vImb = GraphOps.imbalanceLocal(a, Weights.local(g, Weights.Unit), k)
    assert(cImb <= 0.2, s"combined imbalance $cImb")
    assert(vImb > cImb, s"expected vertex imbalance ($vImb) > combined ($cImb)")
  }
}
