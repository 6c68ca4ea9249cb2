package repro

import repro.core.MLGraph
import scala.util.Random

/** Deterministic random multi-layer graphs for tests. */
object TestGraphs {

  /** Erdos-Renyi per layer with edge probability `p`. */
  def random(seed: Long, n: Int, l: Int, p: Double): MLGraph = {
    val rng = new Random(seed)
    val edges = for {
      li <- 0 until l
      u <- 0 until n
      v <- (u + 1) until n
      if rng.nextDouble() < p
    } yield (li, u, v)
    MLGraph.fromEdges(l, n, edges)
  }

  /** ER background plus one planted clique on a subset of layers. */
  def withPlantedClique(seed: Long, n: Int, l: Int, p: Double,
                        clique: Range, layers: Seq[Int]): MLGraph = {
    val rng = new Random(seed)
    val bg = for {
      li <- 0 until l
      u <- 0 until n
      v <- (u + 1) until n
      if rng.nextDouble() < p
    } yield (li, u, v)
    val planted = for {
      li <- layers
      u <- clique
      v <- clique
      if u < v
    } yield (li, u, v)
    MLGraph.fromEdges(l, n, bg ++ planted)
  }

  /** A tiny fully hand-checkable 2-layer graph:
    * layer 0: triangle {0,1,2} + edge (3,4); layer 1: square 0-1-2-3-0.
    */
  def tiny: MLGraph = MLGraph.fromEdges(2, 5, Seq(
    (0, 0, 1), (0, 1, 2), (0, 0, 2), (0, 3, 4),
    (1, 0, 1), (1, 1, 2), (1, 2, 3), (1, 0, 3),
  ))
}
