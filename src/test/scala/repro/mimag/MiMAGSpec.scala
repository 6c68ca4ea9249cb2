package repro.mimag

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.MLGraph

class MiMAGSpec extends AnyFunSuite {

  // ---- quasi-clique predicate ---------------------------------------------
  test("requiredDegree matches ceil(gamma*(size-1))") {
    assert(QuasiClique.requiredDegree(0.8, 3) == 2)
    assert(QuasiClique.requiredDegree(0.8, 4) == 3)
    assert(QuasiClique.requiredDegree(0.8, 5) == 4)
    assert(QuasiClique.requiredDegree(0.8, 6) == 4)
    assert(QuasiClique.requiredDegree(0.5, 5) == 2)
    assert(QuasiClique.requiredDegree(1.0, 5) == 4)
  }

  test("a triangle is a 0.8-quasi-clique; a path is not") {
    val g = MLGraph.fromEdges(1, 5, Seq((0, 0, 1), (0, 1, 2), (0, 0, 2), (0, 3, 4)))
    assert(QuasiClique.isQuasiClique(g, 0, Array(0, 1, 2), 0.8))
    val path = MLGraph.fromEdges(1, 3, Seq((0, 0, 1), (0, 1, 2)))
    assert(!QuasiClique.isQuasiClique(path, 0, Array(0, 1, 2), 0.8))
    assert(QuasiClique.isQuasiClique(path, 0, Array(0, 1, 2), 0.5))
  }

  test("singleton and pair edge cases") {
    val g = MLGraph.fromEdges(1, 3, Seq((0, 0, 1)))
    assert(QuasiClique.isQuasiClique(g, 0, Array(2), 0.8))
    assert(QuasiClique.isQuasiClique(g, 0, Array(0, 1), 0.8))
    assert(!QuasiClique.isQuasiClique(g, 0, Array(0, 2), 0.8))
  }

  test("isQuasiClique agrees with a brute check on random graphs") {
    for (seed <- 1 to 4) {
      val g = TestGraphs.random(900 + seed, 12, 2, 0.4)
      val rng = new scala.util.Random(seed)
      (0 until 30).foreach { _ =>
        val vs = (0 until 12).filter(_ => rng.nextDouble() < 0.4).toArray
        if (vs.length >= 2) {
          val need = QuasiClique.requiredDegree(0.6, vs.length)
          val brute = vs.forall(v => g.neighbors(0, v).count(vs.contains) >= need)
          assert(QuasiClique.isQuasiClique(g, 0, vs, 0.6) == brute)
        }
      }
    }
  }

  test("supportLayers counts layers with the property") {
    val g = MLGraph.fromEdges(3, 3, Seq(
      (0, 0, 1), (0, 1, 2), (0, 0, 2),  // triangle on layer 0
      (1, 0, 1), (1, 1, 2), (1, 0, 2),  // triangle on layer 1
      (2, 0, 1),                        // just an edge on layer 2
    ))
    assert(QuasiClique.supportLayers(g, Array(0, 1, 2), 0.8).toSeq == Seq(0, 1))
  }

  // ---- miner --------------------------------------------------------------
  test("finds a planted cross-layer clique") {
    val g = TestGraphs.withPlantedClique(910, 20, 3, 0.02, 0 until 5, Seq(0, 1))
    val out = MiMAG.run(g, MiMAG.Config(gamma = 0.8, minSize = 4, minSupport = 2))
    assert(!out.truncated)
    assert(out.clusters.exists(c => (0 until 5).forall(c.vertices.contains)),
      s"clusters found: ${out.clusters.map(_.vertices.mkString("{", ",", "}"))}")
  }

  test("every reported cluster is a gamma-QC on at least minSupport layers") {
    for (seed <- 1 to 3) {
      val g = TestGraphs.random(920 + seed, 20, 3, 0.25)
      val cfg = MiMAG.Config(gamma = 0.8, minSize = 3, minSupport = 2)
      val out = MiMAG.run(g, cfg)
      out.clusters.foreach { c =>
        assert(c.vertices.length >= cfg.minSize)
        val supp = QuasiClique.supportLayers(g, c.vertices, cfg.gamma)
        assert(supp.length >= cfg.minSupport)
        assert(c.layers.toSeq == supp.toSeq)
      }
    }
  }

  test("reported clusters are locally maximal") {
    for (seed <- 1 to 3) {
      val g = TestGraphs.random(930 + seed, 16, 3, 0.3)
      val cfg = MiMAG.Config(gamma = 0.8, minSize = 3, minSupport = 2)
      val out = MiMAG.run(g, cfg)
      out.allMaximal.take(20).foreach { c =>
        (0 until g.numVertices).filterNot(c.vertices.contains).foreach { u =>
          val ext = (c.vertices :+ u).sorted
          assert(QuasiClique.supportLayers(g, ext, cfg.gamma).length < cfg.minSupport ||
                 !g.unionAdj(u).exists(c.vertices.contains),
            s"cluster ${c.vertices.mkString(",")} extendable by $u")
        }
      }
    }
  }

  test("diversified output has bounded overlap") {
    val g = TestGraphs.random(940, 20, 3, 0.35)
    val cfg = MiMAG.Config(gamma = 0.8, minSize = 3, minSupport = 1, redundancy = 0.25)
    val out = MiMAG.run(g, cfg)
    val covered = scala.collection.mutable.Set.empty[Int]
    out.clusters.foreach { c =>
      val overlap = c.vertices.count(covered.contains)
      assert(overlap <= 0.25 * c.vertices.length + 1e-9)
      covered ++= c.vertices
    }
  }

  test("node budget truncation is reported") {
    val g = TestGraphs.random(941, 25, 2, 0.5)
    val out = MiMAG.run(g, MiMAG.Config(gamma = 0.6, minSize = 3, minSupport = 1,
                                        nodeBudget = 50))
    assert(out.truncated)
  }

  test("empty graph yields no clusters") {
    val out = MiMAG.run(MLGraph.empty(2, 5), MiMAG.Config(minSize = 3, minSupport = 1))
    assert(out.clusters.isEmpty && !out.truncated)
  }
}
