package repro.core

/** Procedure dCC (paper Appendix B): compute the d-coherent core of a
  * multi-layer graph w.r.t. a set of layers `L`.
  *
  * Iteratively removes every vertex whose degree on *some* layer of `L`
  * (within the surviving set) is below `d`, until the remaining induced
  * subgraph is d-dense on all layers of `L`. The paper drives the peel with
  * bin-sorted `m(v) = min_i deg_i(v)` arrays; we use an equivalent
  * worklist peel — identical output (the d-CC is unique, Property 1) and the
  * same O((n + m)·|L|) bound, since each (vertex, layer) degree transition
  * below `d` enqueues at most once and each edge is touched O(|L|) times.
  */
object Dcc {

  /** d-CC of `g` w.r.t. `layers`, restricted to the induced subgraph on
    * `within` (`null` means all vertices). Returns a sorted vertex array.
    */
  def compute(g: MLGraph, layers: Array[Int], d: Int,
              within: Array[Int] = null): Array[Int] = {
    require(layers.nonEmpty, "dCC needs at least one layer")
    val verts: Array[Int] = if (within == null) Array.range(0, g.numVertices) else within
    if (d <= 0) return verts.sorted // every vertex has degree >= 0

    val n = g.numVertices
    val nl = layers.length
    val present = new java.util.BitSet(n)
    verts.foreach(present.set)

    // deg(li)(v): degree of v within the surviving set on layers(li)
    val deg = Array.ofDim[Int](nl, n)
    val stack = new java.util.ArrayDeque[Int]()
    val queued = new java.util.BitSet(n)

    var li = 0
    while (li < nl) {
      val layer = layers(li)
      verts.foreach { v =>
        var c = 0
        g.neighbors(layer, v).foreach(u => if (present.get(u)) c += 1)
        deg(li)(v) = c
        if (c < d && !queued.get(v)) { queued.set(v); stack.push(v) }
      }
      li += 1
    }

    while (!stack.isEmpty) {
      val v = stack.pop()
      if (present.get(v)) {
        present.clear(v)
        var i = 0
        while (i < nl) {
          val layer = layers(i)
          g.neighbors(layer, v).foreach { u =>
            if (present.get(u)) {
              deg(i)(u) -= 1
              if (deg(i)(u) < d && !queued.get(u)) { queued.set(u); stack.push(u) }
            }
          }
          i += 1
        }
      }
    }

    val out = verts.filter(present.get)
    java.util.Arrays.sort(out)
    out
  }

  /** Naive fixpoint reference (tests): repeatedly drop any vertex with a
    * sub-d degree on some layer of `L`, recomputing from scratch each round.
    */
  def naive(g: MLGraph, layers: Array[Int], d: Int,
            within: Array[Int] = null): Array[Int] = {
    var cur: Set[Int] =
      (if (within == null) Array.range(0, g.numVertices) else within).toSet
    var changed = true
    while (changed) {
      changed = false
      val bad = cur.filter { v =>
        layers.exists(l => g.neighbors(l, v).count(cur.contains) < d)
      }
      if (bad.nonEmpty) { cur = cur -- bad; changed = true }
    }
    cur.toArray.sorted
  }
}
