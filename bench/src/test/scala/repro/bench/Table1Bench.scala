package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Experiments

/** Table 1 — impact of partitioning policy on PR superstep runtime and
  * communication across workers (paper: FB-400B, 128 workers; here:
  * FB-lite-15, 16 workers, calibrated to the paper's Hash row).
  *
  * Shape claims under test (from the paper's Table 1):
  *   - one-dimensional balancing produces stragglers: vertex-mode max
  *     runtime far exceeds its mean; vertex-edge mode is tight;
  *   - vertex-edge has the lowest max runtime of all policies;
  *   - every GD mode communicates less than Hash, with vertex mode (highest
  *     locality) communicating least on average;
  *   - Hash communication is uniform across workers (max ≈ mean) while
  *     one-dimensional policies are skewed (max ≫ mean).
  */
class Table1Bench extends AnyFunSuite {

  private lazy val rows = Experiments.table1(scale = 15, k = 16)
  private def byPolicy(p: String) = rows.find(_.policy == p).get

  test("table 1 runs and reports all four policies") {
    assert(rows.map(_.policy) == Experiments.Policies)
    rows.foreach(r => assert(r.stats.runtimeMean > 0 && r.stats.totalTime > 0))
  }

  test("hash is calibrated to the paper's scale (95 s, 69.5 GB)") {
    val h = byPolicy("hash").stats
    assert(math.abs(h.runtimeMean - 95.0) < 1e-6)
    assert(math.abs(h.commMean - 69.5) < 1e-6)
  }

  test("vertex-edge has the lowest max runtime (no straggler)") {
    val ve = byPolicy("vertex-edge").stats.runtimeMax
    assert(ve < byPolicy("vertex").stats.runtimeMax)
    assert(ve < byPolicy("hash").stats.runtimeMax)
    assert(ve <= byPolicy("edge").stats.runtimeMax)
  }

  test("one-dimensional vertex balancing produces a straggler") {
    val v = byPolicy("vertex").stats
    val ve = byPolicy("vertex-edge").stats
    assert(v.runtimeMax / v.runtimeMean > ve.runtimeMax / ve.runtimeMean)
  }

  test("every GD mode communicates less than hash") {
    val hash = byPolicy("hash").stats.commMean
    Seq("vertex", "edge", "vertex-edge").foreach { p =>
      assert(byPolicy(p).stats.commMean < hash, s"$p comm not below hash")
    }
  }

  test("hash communication is uniform across workers; GD modes are skewed") {
    val h = byPolicy("hash").stats
    val v = byPolicy("vertex").stats
    assert(h.commMax / h.commMean < 1.25, "hash comm should be near-uniform")
    assert(v.commMax / v.commMean > h.commMax / h.commMean)
  }

  test("GD policies achieve far higher locality than hash") {
    // RMAT substitutes have weaker communities than the real FB graph, so
    // the edge-balanced modes land lower in absolute terms; the claim under
    // test is the relative one.
    val hash = byPolicy("hash").locality
    Seq("vertex", "edge", "vertex-edge").foreach { p =>
      assert(byPolicy(p).locality > 2 * hash, s"$p locality ${byPolicy(p).locality}")
    }
  }

  test("two-dimensional balancing keeps both dimensions balanced") {
    val ve = byPolicy("vertex-edge")
    assert(ve.vertexImb < 0.15, s"vertex imbalance ${ve.vertexImb}")
    assert(ve.edgeImb < 0.15, s"edge imbalance ${ve.edgeImb}")
  }

  test("one-dimensional policies leave the other dimension imbalanced") {
    val v = byPolicy("vertex")
    val e = byPolicy("edge")
    assert(v.edgeImb > v.vertexImb, "vertex mode should leave edges imbalanced")
    assert(e.vertexImb > e.edgeImb, "edge mode should leave vertices imbalanced")
  }

  test("vertex-edge beats hash on total job time (paper: 13.2% on PR)") {
    assert(byPolicy("vertex-edge").stats.totalTime < byPolicy("hash").stats.totalTime)
  }
}
