package repro.core

/** Brute-force DCCS for tiny instances: materialize every candidate d-CC and
  * exhaustively search all k-subsets for the maximum cover. Exponential in
  * C(l, s) choose k — only used by tests and sanity jobs to validate the
  * approximation ratios of GD/BU/TD.
  */
object ExactDCCS {

  /** All candidate d-CCs F_{d,s}(G), one per layer subset of size s. */
  def candidates(g: MLGraph, d: Int, s: Int): Vector[Core] =
    (0 until g.numLayers).combinations(s).map { combo =>
      Core(combo.toVector, Dcc.compute(g, combo.toArray, d))
    }.toVector

  /** Optimal k-subset of `cands` by cover size (exhaustive). */
  def bestCover(cands: Vector[Core], k: Int): (Vector[Core], Int) = {
    if (cands.isEmpty) return (Vector.empty, 0)
    val kk = math.min(k, cands.length)
    var best: Vector[Core] = Vector.empty
    var bestCov = -1
    cands.indices.combinations(kk).foreach { idxs =>
      val sel = idxs.map(cands).toVector
      val cov = SetOps.coverSize(sel.map(_.vertices))
      if (cov > bestCov) { bestCov = cov; best = sel }
    }
    (best, bestCov)
  }

  /** Exact DCCS optimum value for a tiny instance. */
  def optimum(g: MLGraph, d: Int, s: Int, k: Int): Int =
    bestCover(candidates(g, d, s), k)._2
}
