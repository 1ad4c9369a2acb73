package repro.graphs

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** CSR construction and operation invariants. */
class LocalGraphSpec extends AnyFunSuite {

  test("fromEdges removes self-loops") {
    val g = LocalGraph.fromEdges(3, Array((0, 0), (0, 1), (1, 1)))
    assert(g.numEdges == 1)
    assert(g.degree(0) == 1 && g.degree(1) == 1 && g.degree(2) == 0)
  }

  test("fromEdges deduplicates parallel edges in both orientations") {
    val g = LocalGraph.fromEdges(2, Array((0, 1), (1, 0), (0, 1)))
    assert(g.numEdges == 1)
  }

  test("degree sum equals twice the edge count") {
    val g = GraphGen.rmatLocal(8, 4, seed = 3)
    assert((0 until g.n).map(g.degree).sum.toLong == 2 * g.numEdges)
  }

  test("edges roundtrip: fromEdges(edges) has identical edge set") {
    val g = GraphGen.rmatLocal(7, 4, seed = 5)
    val g2 = LocalGraph.fromEdges(g.n, g.edges)
    assert(g2.edges.toSeq == g.edges.toSeq)
  }

  test("adjacency lists are sorted and symmetric") {
    val g = GraphGen.rmatLocal(7, 6, seed = 11)
    for (u <- 0 until g.n) {
      val ns = (g.offsets(u) until g.offsets(u + 1)).map(g.adj)
      assert(ns == ns.sorted)
      ns.foreach { v =>
        val back = (g.offsets(v) until g.offsets(v + 1)).map(g.adj)
        assert(back.contains(u), s"edge $u-$v not symmetric")
      }
    }
  }

  test("uncutEdges: all-same-part counts every edge; alternating path counts none") {
    val p = GraphGen.path(10)
    assert(p.uncutEdges(Array.fill(10)(0)) == 9)
    assert(p.uncutEdges(Array.tabulate(10)(_ % 2)) == 0)
    assert(p.edgeLocality(Array.fill(10)(1)) == 1.0)
  }

  test("edgeLocality of empty graph is 1") {
    val g = LocalGraph.fromEdges(4, Array.empty)
    assert(g.edgeLocality(Array.fill(4)(0)) == 1.0)
  }

  for (seed <- 1 to 8) {
    test(s"inducedSubgraph keeps exactly the internal edges (seed=$seed)") {
      val rng = new Random(seed)
      val g = GraphGen.rmatLocal(7, 4, seed = seed)
      val keep = Array.fill(g.n)(rng.nextBoolean())
      val (sub, toOld) = g.inducedSubgraph(keep)
      assert(toOld.length == keep.count(identity))
      assert(sub.n == toOld.length)
      val expected = g.edges.filter { case (u, v) => keep(u) && keep(v) }
        .map { case (u, v) => (toOld.indexOf(u), toOld.indexOf(v)) }
        .map { case (u, v) => if (u < v) (u, v) else (v, u) }.sorted
      assert(sub.edges.toSeq.sorted == expected.toSeq)
    }
  }

  test("inducedSubgraph preserves original ids mapping") {
    val g = GraphGen.twoCliquesBridge(5)
    val keep = Array.tabulate(g.n)(_ < 5)
    val (sub, toOld) = g.inducedSubgraph(keep)
    assert(toOld.toSeq == (0 until 5))
    assert(sub.numEdges == 10) // K5
  }

  test("grid graph structure") {
    val g = GraphGen.grid(3, 4)
    assert(g.n == 12)
    assert(g.numEdges == 3 * 3 + 2 * 4) // horizontal + vertical
  }

  test("complete graph K6 has 15 edges, all degrees 5") {
    val g = GraphGen.complete(6)
    assert(g.numEdges == 15)
    assert((0 until 6).forall(g.degree(_) == 5))
  }

  test("star graph has one hub") {
    val g = GraphGen.star(10)
    assert(g.degree(0) == 9)
    assert((1 until 10).forall(g.degree(_) == 1))
  }

  test("cycle degrees are all 2") {
    val g = GraphGen.cycle(17)
    assert((0 until 17).forall(g.degree(_) == 2))
    assert(g.numEdges == 17)
  }
}
