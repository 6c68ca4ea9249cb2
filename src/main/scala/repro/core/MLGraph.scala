package repro.core

import scala.collection.mutable

/** Immutable in-memory multi-layer graph `G = (V, E_1, ..., E_l)`.
  *
  * Vertices are dense integer ids `0 until numVertices`; every layer shares
  * the vertex set (vertices missing from a layer are simply isolated there,
  * as in Section II of the paper). `adj(layer)(v)` is the sorted, distinct
  * neighbor list of `v` on that layer; edges are undirected.
  */
final class MLGraph private (
    val numLayers: Int,
    val numVertices: Int,
    val adj: Array[Array[Array[Int]]],
) {

  /** Degree of `v` on `layer` in the full graph. */
  def degree(layer: Int, v: Int): Int = adj(layer)(v).length

  /** Sorted neighbor ids of `v` on `layer`. */
  def neighbors(layer: Int, v: Int): Array[Int] = adj(layer)(v)

  /** Number of undirected edges on `layer`. */
  def edgeCount(layer: Int): Long =
    adj(layer).iterator.map(_.length.toLong).sum / 2

  /** Sum of per-layer edge counts (an edge on two layers counts twice). */
  def totalEdgeCount: Long = (0 until numLayers).map(edgeCount).sum

  /** Union adjacency across all layers (distinct neighbors on any layer). */
  lazy val unionAdj: Array[Array[Int]] = {
    val out = new Array[Array[Int]](numVertices)
    var v = 0
    while (v < numVertices) {
      val set = mutable.SortedSet.empty[Int]
      var i = 0
      while (i < numLayers) { adj(i)(v).foreach(set += _); i += 1 }
      out(v) = set.toArray
      v += 1
    }
    out
  }

  /** Number of distinct undirected edges across all layers. */
  def unionEdgeCount: Long = unionAdj.iterator.map(_.length.toLong).sum / 2

  /** Graph with layers reordered so new layer `p` is old layer `order(p)`. */
  def permuteLayers(order: Array[Int]): MLGraph = {
    require(order.length == numLayers && order.toSet == (0 until numLayers).toSet,
      s"order must be a permutation of 0..${numLayers - 1}")
    new MLGraph(numLayers, numVertices, order.map(adj))
  }

  /** Multi-layer subgraph keeping only the given layers (in given order). */
  def selectLayers(layers: Seq[Int]): MLGraph =
    new MLGraph(layers.length, numVertices, layers.map(adj).toArray)

  /** Induced subgraph on `vertices` with ids re-densified to 0..m-1.
    * Returns the subgraph and the old-id of each new id.
    */
  def induced(vertices: Array[Int]): (MLGraph, Array[Int]) = {
    val old = vertices.sorted.distinct
    val newId = new mutable.HashMap[Int, Int]()
    old.iterator.zipWithIndex.foreach { case (o, i) => newId(o) = i }
    val edges = mutable.ArrayBuffer.empty[(Int, Int, Int)]
    var li = 0
    while (li < numLayers) {
      old.foreach { u =>
        adj(li)(u).foreach { w =>
          if (u < w && newId.contains(w)) edges += ((li, newId(u), newId(w)))
        }
      }
      li += 1
    }
    (MLGraph.fromEdges(numLayers, old.length, edges), old)
  }

  /** All undirected edges as (layer, u, v) with u < v. */
  def edgeTriples: Iterator[(Int, Int, Int)] =
    for {
      li <- (0 until numLayers).iterator
      u  <- (0 until numVertices).iterator
      w  <- adj(li)(u).iterator
      if u < w
    } yield (li, u, w)
}

object MLGraph {

  /** Build from undirected edge triples (layer, u, v); duplicates and
    * self-loops are dropped, orientation normalized.
    */
  def fromEdges(numLayers: Int, numVertices: Int,
                edges: IterableOnce[(Int, Int, Int)]): MLGraph = {
    val sets = Array.fill(numLayers, numVertices)(mutable.SortedSet.empty[Int])
    edges.iterator.foreach { case (li, u, v) =>
      require(li >= 0 && li < numLayers, s"bad layer $li")
      require(u >= 0 && u < numVertices && v >= 0 && v < numVertices, s"bad edge ($u,$v)")
      if (u != v) { sets(li)(u) += v; sets(li)(v) += u }
    }
    new MLGraph(numLayers, numVertices, sets.map(_.map(_.toArray)))
  }

  /** Empty graph. */
  def empty(numLayers: Int, numVertices: Int): MLGraph =
    fromEdges(numLayers, numVertices, Iterator.empty)
}
