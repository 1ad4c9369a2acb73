package repro.graphs

import org.apache.spark.sql.DataFrame

/** Immutable CSR (compressed sparse row) representation of a simple
  * undirected graph on vertices `0 until n`.
  *
  * Each undirected edge {u,v} is stored twice in `adj` (once per endpoint),
  * so `adj.length == 2 * numEdges`. Self-loops and parallel edges are
  * removed by the builders.
  *
  * This is the in-core mirror used by the reference GD implementation and
  * the baseline partitioners; the distributed path works on the DataFrame
  * edge list directly.
  */
final class LocalGraph(val n: Int, val offsets: Array[Int], val adj: Array[Int]) {

  /** Number of undirected edges. */
  def numEdges: Long = adj.length.toLong / 2

  /** Degree of vertex `v`. */
  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Apply `f` to each neighbor of `v`. */
  @inline def foreachNeighbor(v: Int)(f: Int => Unit): Unit = {
    var i = offsets(v)
    val end = offsets(v + 1)
    while (i < end) { f(adj(i)); i += 1 }
  }

  /** All undirected edges as (u, v) with u < v. */
  def edges: Array[(Int, Int)] = {
    val b = Array.newBuilder[(Int, Int)]
    var u = 0
    while (u < n) {
      foreachNeighbor(u)(v => if (u < v) b += ((u, v)))
      u += 1
    }
    b.result()
  }

  /** Number of edges with both endpoints in the same part of `assign`. */
  def uncutEdges(assign: Array[Int]): Long = {
    var cnt = 0L
    var u = 0
    while (u < n) {
      var i = offsets(u)
      val end = offsets(u + 1)
      while (i < end) {
        val v = adj(i)
        if (u < v && assign(u) == assign(v)) cnt += 1
        i += 1
      }
      u += 1
    }
    cnt
  }

  /** Fraction of edges with both endpoints in the same part. */
  def edgeLocality(assign: Array[Int]): Double =
    if (numEdges == 0) 1.0 else uncutEdges(assign).toDouble / numEdges

  /** Induced subgraph on `keep` (a 0/1 membership mask); returns the
    * subgraph together with the map from new vertex ids to original ids.
    */
  def inducedSubgraph(keep: Array[Boolean]): (LocalGraph, Array[Int]) = {
    val old2new = new Array[Int](n)
    java.util.Arrays.fill(old2new, -1)
    val new2old = Array.newBuilder[Int]
    var m = 0
    var v = 0
    while (v < n) {
      if (keep(v)) { old2new(v) = m; new2old += v; m += 1 }
      v += 1
    }
    val es = Array.newBuilder[(Int, Int)]
    var u = 0
    while (u < n) {
      if (keep(u)) {
        foreachNeighbor(u) { w =>
          if (u < w && keep(w)) es += ((old2new(u), old2new(w)))
        }
      }
      u += 1
    }
    (LocalGraph.fromEdges(m, es.result()), new2old.result())
  }
}

object LocalGraph {

  /** Build from an edge list; drops self-loops and duplicate/parallel edges
    * (after canonicalizing to u < v).
    */
  def fromEdges(n: Int, raw: Array[(Int, Int)]): LocalGraph = {
    val canon = raw.iterator
      .filter { case (u, v) => u != v }
      .map { case (u, v) => if (u < v) (u, v) else (v, u) }
      .toArray
      .distinct
    val deg = new Array[Int](n)
    canon.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    val offsets = new Array[Int](n + 1)
    var i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val cursor = offsets.clone()
    val adj = new Array[Int](canon.length * 2)
    canon.foreach { case (u, v) =>
      adj(cursor(u)) = v; cursor(u) += 1
      adj(cursor(v)) = u; cursor(v) += 1
    }
    // sort each adjacency list for deterministic iteration order
    i = 0
    while (i < n) { java.util.Arrays.sort(adj, offsets(i), offsets(i + 1)); i += 1 }
    new LocalGraph(n, offsets, adj)
  }

  /** Collect a canonical (src < dst) DataFrame edge list into a LocalGraph.
    * Vertex ids are remapped to 0..n-1; returns the new-id -> original-id map.
    * Intended for graphs that comfortably fit on the driver.
    */
  def fromDataFrame(edges: DataFrame): (LocalGraph, Array[Long]) = {
    val rows = edges.select("src", "dst").collect()
    val pairs = rows.map(r => (r.getLong(0), r.getLong(1)))
    val ids = pairs.iterator.flatMap(p => Iterator(p._1, p._2)).toArray.distinct.sorted
    val idx = ids.zipWithIndex.toMap
    val es = pairs.map { case (u, v) => (idx(u), idx(v)) }
    (fromEdges(ids.length, es), ids)
  }
}
