package repro.core

import repro.graphs.LocalGraph

/** Recursive k-way partitioning (paper §3.3): bipartition ⌈log₂k⌉ times.
  *
  * Weights are taken from the *original* graph (degree weights keep their
  * full-graph values when recursing, so edge balance tracks global edge
  * counts), while the gradient uses the induced subgraph's edges.
  */
object RecursivePartitioner {

  /** Partition `g` into `k` parts (k must be a power of two ≥ 1) balanced on
    * the given weight vectors. Returns part ids in [0, k).
    */
  def partition(g: LocalGraph, ws: Array[Array[Double]], k: Int, cfg: GDConfig): Array[Int] = {
    require(k >= 1 && (k & (k - 1)) == 0, s"k must be a power of two, got $k")
    val assign = new Array[Int](g.n)
    if (k == 1) return assign

    def recurse(sub: LocalGraph, toOriginal: Array[Int], wsSub: Array[Array[Double]],
                partsLeft: Int, partBase: Int, seed: Long): Unit = {
      if (partsLeft == 1 || sub.n == 0) {
        toOriginal.foreach(v => assign(v) = partBase)
        return
      }
      val res = LocalGD.bipartition(sub, wsSub, cfg.copy(seed = seed))
      val keep0 = Array.tabulate(sub.n)(i => res.side(i) == 0)
      val keep1 = Array.tabulate(sub.n)(i => res.side(i) == 1)
      val (g0, m0) = sub.inducedSubgraph(keep0)
      val (g1, m1) = sub.inducedSubgraph(keep1)
      val ws0 = wsSub.map(w => m0.map(w))
      val ws1 = wsSub.map(w => m1.map(w))
      recurse(g0, m0.map(toOriginal), ws0, partsLeft / 2, partBase, seed * 31 + 1)
      recurse(g1, m1.map(toOriginal), ws1, partsLeft / 2, partBase + partsLeft / 2, seed * 31 + 2)
    }

    recurse(g, Array.tabulate(g.n)(identity), ws, k, 0, cfg.seed)
    assign
  }
}
