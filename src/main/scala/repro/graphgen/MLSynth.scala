package repro.graphgen

import repro.core.MLGraph
import scala.collection.mutable
import scala.util.Random

/** Synthetic multi-layer graphs with planted dense communities.
  *
  * Substitutes the paper's real datasets (PPI, Author, German, Wiki, English,
  * Stack — see DESIGN.md §4). Each community is planted on a random subset of
  * layers with internal minimum degree ≥ `degTarget` on each supporting
  * layer, so it survives d-core peeling for d ≤ degTarget there; a few
  * "persistent" communities are supported on *all* layers so that large-s
  * experiments (s close to l) are non-trivial, mirroring the persistent
  * heavy users of the paper's temporal datasets. Uniform background noise is
  * added per layer. Ground-truth "complexes" (small cliques embedded inside
  * communities on all the community's layers) substitute the MIPS protein
  * complexes of Fig. 29.
  *
  * Everything is deterministic in `spec.seed`.
  */
object MLSynth {

  final case class Spec(
      name: String,
      n: Int,
      l: Int,
      nCommunities: Int,
      minCommSize: Int,
      maxCommSize: Int,
      minSupport: Int,
      maxSupport: Int,
      nPersistent: Int,
      degTarget: Int,
      bgEdgesPerLayer: Int,
      nComplexes: Int,
      complexMin: Int,
      complexMax: Int,
      overlapFrac: Double,
      seed: Long,
  )

  final case class Community(vertices: Array[Int], layers: Array[Int])

  final case class Generated(spec: Spec,
                             graph: MLGraph,
                             communities: Vector[Community],
                             complexes: Vector[Community])

  /** Scaled-down stand-ins for the paper's six datasets (Fig. 12); layer
    * counts match the paper exactly (8, 10, 14, 24, 15, 24).
    */
  val presets: Map[String, Spec] = Map(
    "ppi"     -> Spec("ppi",     330,    8,  8,  8,  16, 4,  6,  2, 5,   250,  6, 4, 6, 0.25, 101L),
    "author"  -> Spec("author",  1000,   10, 12, 10, 20, 5,  8,  2, 5,   600,  8, 4, 6, 0.25, 102L),
    "german"  -> Spec("german",  20000,  14, 40, 30, 80, 4,  9,  4, 6, 40000,  0, 4, 8, 0.30, 103L),
    "wiki"    -> Spec("wiki",    24000,  24, 50, 20, 60, 6, 14,  4, 6, 30000,  0, 4, 8, 0.30, 104L),
    "english" -> Spec("english", 30000,  15, 50, 30, 100, 4, 10, 4, 6, 60000,  0, 4, 8, 0.30, 105L),
    "stack"   -> Spec("stack",   30000,  24, 60, 30, 80, 6, 14,  5, 6, 45000,  0, 4, 8, 0.30, 106L),
  )

  def preset(name: String): Generated =
    generate(presets.getOrElse(name, sys.error(s"unknown preset '$name'")))

  def generate(spec: Spec): Generated = {
    import spec._
    val rng = new Random(seed)
    val edges = mutable.ArrayBuffer.empty[(Int, Int, Int)]
    val comms = Vector.newBuilder[Community]
    val pool = mutable.ArrayBuffer.empty[Int] // vertices already in a community

    def sampleDistinct(count: Int, from: IndexedSeq[Int]): Array[Int] = {
      val picked = mutable.LinkedHashSet.empty[Int]
      var guard = 0
      while (picked.size < count && guard < count * 50) {
        picked += from(rng.nextInt(from.length)); guard += 1
      }
      picked.toArray
    }

    def plantLayeredClique(vs: Array[Int], layers: Array[Int]): Unit =
      layers.foreach { li =>
        var i = 0
        while (i < vs.length) {
          var j = i + 1
          while (j < vs.length) { edges += ((li, vs(i), vs(j))); j += 1 }
          i += 1
        }
      }

    // Plant a near-regular random graph with min degree >= degTarget.
    def plantDense(vs: Array[Int], layers: Array[Int]): Unit = {
      if (vs.length <= degTarget + 1) { plantLayeredClique(vs, layers); return }
      layers.foreach { li =>
        vs.foreach { v =>
          val partners = mutable.HashSet.empty[Int]
          while (partners.size < degTarget) {
            val u = vs(rng.nextInt(vs.length))
            if (u != v) partners += u
          }
          partners.foreach(u => edges += ((li, v, u)))
        }
      }
    }

    val allIds = 0 until n
    val allLayers = Array.range(0, l)
    var c = 0
    while (c < nCommunities) {
      val size = minCommSize + rng.nextInt(math.max(1, maxCommSize - minCommSize + 1))
      val persistent = c < nPersistent
      val supp =
        if (persistent) allLayers.clone()
        else {
          val ns = math.min(l, minSupport + rng.nextInt(math.max(1, maxSupport - minSupport + 1)))
          rng.shuffle(allLayers.toList).take(ns).sorted.toArray
        }
      val nOverlap = if (pool.nonEmpty) (size * overlapFrac).toInt else 0
      val vs = (sampleDistinct(nOverlap, pool.toIndexedSeq) ++
                sampleDistinct(size - nOverlap, allIds)).distinct
      plantDense(vs, supp)
      pool ++= vs
      comms += Community(vs.sorted, supp)
      c += 1
    }
    val communities = comms.result()

    // Ground-truth complexes: cliques inside communities on all their layers.
    val complexes = Vector.newBuilder[Community]
    var x = 0
    while (x < nComplexes && communities.nonEmpty) {
      val host = communities(rng.nextInt(communities.length))
      val size = math.min(host.vertices.length,
        complexMin + rng.nextInt(math.max(1, complexMax - complexMin + 1)))
      val vs = rng.shuffle(host.vertices.toList).take(size).sorted.toArray
      plantLayeredClique(vs, host.layers)
      complexes += Community(vs, host.layers)
      x += 1
    }

    // Uniform background noise per layer.
    var li = 0
    while (li < l) {
      var e = 0
      while (e < bgEdgesPerLayer) {
        val u = rng.nextInt(n); val v = rng.nextInt(n)
        if (u != v) edges += ((li, u, v))
        e += 1
      }
      li += 1
    }

    Generated(spec, MLGraph.fromEdges(l, n, edges), communities, complexes.result())
  }

  /** Induced subgraph on a random fraction `p` of vertices (Fig. 26). */
  def subsampleVertices(gen: Generated, p: Double, seed: Long = 7L): MLGraph = {
    if (p >= 1.0) return gen.graph
    val rng = new Random(seed)
    val keep = (0 until gen.graph.numVertices).filter(_ => rng.nextDouble() < p)
    gen.graph.induced(keep.toArray)._1
  }

  /** Subgraph on a random fraction `q` of layers (Fig. 27). */
  def subsampleLayers(gen: Generated, q: Double, seed: Long = 8L): MLGraph = {
    if (q >= 1.0) return gen.graph
    val rng = new Random(seed)
    val l = gen.graph.numLayers
    val nKeep = math.max(1, math.round(q * l).toInt)
    val keep = rng.shuffle((0 until l).toList).take(nKeep).sorted
    gen.graph.selectLayers(keep)
  }
}
