package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graphs.{GraphGen, GraphOps}
import repro.baselines.HashPartition

/** Recursive k-way partitioning (§3.3). */
class RecursiveSpec extends AnyFunSuite {

  test("k must be a power of two") {
    val g = GraphGen.rmatLocal(6, 3)
    intercept[IllegalArgumentException] {
      RecursivePartitioner.partition(g, Weights.localAll(g, Seq(Weights.Unit)), 3, GDConfig())
    }
  }

  test("k=1 puts everything in part 0") {
    val g = GraphGen.rmatLocal(6, 3)
    val a = RecursivePartitioner.partition(g, Weights.localAll(g, Seq(Weights.Unit)), 1, GDConfig())
    assert(a.forall(_ == 0))
  }

  for (k <- Seq(2, 4, 8)) {
    test(s"k=$k: all parts used and balance within compounded eps") {
      val g = GraphGen.rmatLocal(10, 8, seed = 21)
      val ws = Weights.localAll(g, Seq(Weights.Unit, Weights.Degree))
      val a = RecursivePartitioner.partition(g, ws, k, GDConfig(eps = 0.02, seed = 5))
      assert(a.forall(p => p >= 0 && p < k))
      assert(a.toSet.size == k, "every part should be non-empty")
      val compounded = math.pow(1.02, math.log(k) / math.log(2)).toDouble - 1 + 0.05
      ws.foreach { w =>
        val imb = GraphOps.imbalanceLocal(a, w, k)
        assert(imb <= compounded, s"imbalance $imb > $compounded for k=$k")
      }
    }
  }

  test("k=4 on 4 planted communities recovers high locality") {
    val g = GraphGen.plantedKCommunities(4, 50, 0.25, 0.01, seed = 7)
    val ws = Weights.localAll(g, Seq(Weights.Unit))
    val a = RecursivePartitioner.partition(g, ws, 4, GDConfig(eps = 0.05, seed = 5))
    val hash = HashPartition.partition(g.n, 4)
    assert(g.edgeLocality(a) > 0.6)
    assert(g.edgeLocality(a) > g.edgeLocality(hash) + 0.3)
  }

  test("recursion inherits full-graph degree weights (edge balance global)") {
    val g = GraphGen.rmatLocal(10, 8, seed = 23)
    val wDeg = Weights.local(g, Weights.Degree)
    val a = RecursivePartitioner.partition(g, Array(wDeg), 4, GDConfig(eps = 0.02, seed = 5))
    val imb = GraphOps.imbalanceLocal(a, wDeg, 4)
    assert(imb <= 0.15, s"global degree imbalance $imb")
  }

  test("deterministic in the seed") {
    val g = GraphGen.rmatLocal(8, 5, seed = 24)
    val ws = Weights.localAll(g, Seq(Weights.Unit))
    val a = RecursivePartitioner.partition(g, ws, 4, GDConfig(seed = 11))
    val b = RecursivePartitioner.partition(g, ws, 4, GDConfig(seed = 11))
    assert(a.toSeq == b.toSeq)
  }
}
