package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Figure 7 (as table) — simulated Giraph speedup over Hash for PR, CC, HC,
  * MF under vertex / edge / vertex-edge GD partitioning, in a small
  * (FB-lite-15, 16 workers) and a large (FB-lite-16, 128 workers) setup.
  *
  * Paper's shape: two-dimensional (vertex-edge) partitioning always speeds
  * up over Hash (10–30%); one-dimensional partitioning is inconsistent and
  * can regress, especially with many workers.
  */
class SpeedupBench extends AnyFunSuite {

  private lazy val rows = Experiments.speedups()
  private def get(wl: String, config: String, policy: String) =
    rows.find(r => r.workload == wl && r.config == config && r.policy == policy).get.speedupPct

  test("all 24 combinations reported") { assert(rows.size == 4 * 2 * 3) }

  test("vertex-edge partitioning speeds up every workload in every config") {
    rows.filter(_.policy == "vertex-edge").foreach { r =>
      assert(r.speedupPct > 0, s"${r.workload}/${r.config}: ${r.speedupPct}%")
    }
  }

  test("vertex-edge speedups are in the paper's 10-30% ballpark on average") {
    val ve = rows.filter(_.policy == "vertex-edge").map(_.speedupPct)
    val avg = ve.sum / ve.size
    assert(avg > 5 && avg < 60, s"average vertex-edge speedup $avg%")
  }

  test("one-dimensional partitioning is not consistently beneficial") {
    val oneDim = rows.filter(r => r.policy == "vertex" || r.policy == "edge")
    val worst = oneDim.map(_.speedupPct).min
    val veWorst = rows.filter(_.policy == "vertex-edge").map(_.speedupPct).min
    assert(worst < veWorst, s"one-dim worst $worst should undercut vertex-edge worst $veWorst")
  }

  test("vertex-edge beats vertex-only for every workload in the large config") {
    for (wl <- Seq("PR", "CC", "HC", "MF")) {
      assert(get(wl, "large", "vertex-edge") > get(wl, "large", "vertex"),
        s"$wl: ${get(wl, "large", "vertex-edge")} vs ${get(wl, "large", "vertex")}")
    }
  }
}
