package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Figure 4 (as table) — vertex and edge imbalance of the five algorithms on
  * the three public-graph substitutes, k ∈ {2, 8}.
  *
  * Paper's shape: Hash and GD are near-balanced everywhere (< 0.01/0.05);
  * BLP is balanced; Spinner and SHP cannot hold both dimensions on skewed
  * graphs (some partitions 1.5–2x over average on Twitter).
  */
class ImbalanceBench extends AnyFunSuite {

  private lazy val rows = Experiments.imbalanceTable()
  private def get(graph: String, algo: String, k: Int) =
    rows.find(r => r.graph == graph && r.algo == algo && r.k == k).get

  test("all 30 combinations are reported") {
    assert(rows.size == 3 * 2 * 5)
  }

  test("hash is near-balanced on both dimensions everywhere") {
    // Hash edge balance concentrates at the paper's scale (hubs are a
    // negligible fraction of a part there); at ours a single hub is a
    // visible fraction of a part, so the edge threshold is looser.
    rows.filter(_.algo == "Hash").foreach { r =>
      assert(r.vertexImb < 0.05 && r.edgeImb < 0.2,
        s"${r.graph} k=${r.k}: ${r.vertexImb}/${r.edgeImb}")
    }
  }

  test("GD is near-balanced on both dimensions everywhere") {
    rows.filter(_.algo == "GD").foreach { r =>
      assert(r.vertexImb < 0.08 && r.edgeImb < 0.08,
        s"${r.graph} k=${r.k}: ${r.vertexImb}/${r.edgeImb}")
    }
  }

  test("BLP holds multi-dimensional balance (coarser than GD at our scale)") {
    rows.filter(_.algo == "BLP").foreach { r =>
      assert(r.vertexImb < 0.3 && r.edgeImb < 0.3,
        s"${r.graph} k=${r.k}: ${r.vertexImb}/${r.edgeImb}")
    }
  }

  test("spinner cannot hold vertex balance on the skewed graph") {
    val r = get("Twitter-lite", "Spinner", 8)
    assert(r.vertexImb > 0.2, s"expected large vertex imbalance, got ${r.vertexImb}")
    assert(r.vertexImb > get("Twitter-lite", "GD", 8).vertexImb * 3)
  }

  test("SHP cannot hold vertex balance on the skewed graph") {
    val r = get("Twitter-lite", "SHP", 8)
    assert(r.vertexImb > 0.2, s"expected large vertex imbalance, got ${r.vertexImb}")
  }

  test("GD dominates Spinner and SHP on worst-case imbalance") {
    for (k <- Seq(2, 8); graph <- Seq("LiveJournal-lite", "Orkut-lite", "Twitter-lite")) {
      val gd = get(graph, "GD", k)
      val sp = get(graph, "Spinner", k)
      val sh = get(graph, "SHP", k)
      val gdWorst = math.max(gd.vertexImb, gd.edgeImb)
      assert(gdWorst <= math.max(sp.vertexImb, sp.edgeImb) + 0.02, s"$graph k=$k vs Spinner")
      assert(gdWorst <= math.max(sh.vertexImb, sh.edgeImb) + 0.02, s"$graph k=$k vs SHP")
    }
  }
}
