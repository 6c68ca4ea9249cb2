package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs

class MLGraphSpec extends AnyFunSuite {

  test("fromEdges dedups, drops self-loops, normalizes orientation") {
    val g = MLGraph.fromEdges(1, 4, Seq((0, 0, 1), (0, 1, 0), (0, 0, 1), (0, 2, 2), (0, 2, 3)))
    assert(g.edgeCount(0) == 2)
    assert(g.neighbors(0, 0).toSeq == Seq(1))
    assert(g.neighbors(0, 1).toSeq == Seq(0))
    assert(g.neighbors(0, 2).toSeq == Seq(3))
  }

  test("adjacency is sorted and symmetric") {
    val g = TestGraphs.random(1, 30, 3, 0.2)
    for (li <- 0 until 3; v <- 0 until 30) {
      val ns = g.neighbors(li, v).toSeq
      assert(ns == ns.sorted)
      ns.foreach(u => assert(g.neighbors(li, u).contains(v)))
    }
  }

  test("edgeTriples round-trips through fromEdges") {
    val g = TestGraphs.random(2, 25, 4, 0.15)
    val g2 = MLGraph.fromEdges(4, 25, g.edgeTriples.toSeq)
    for (li <- 0 until 4; v <- 0 until 25)
      assert(g.neighbors(li, v).toSeq == g2.neighbors(li, v).toSeq)
  }

  test("tiny graph degrees and counts") {
    val g = TestGraphs.tiny
    assert(g.numLayers == 2 && g.numVertices == 5)
    assert(g.edgeCount(0) == 4 && g.edgeCount(1) == 4)
    assert(g.degree(0, 0) == 2 && g.degree(0, 3) == 1 && g.degree(1, 4) == 0)
    assert(g.totalEdgeCount == 8)
  }

  test("unionAdj merges layers") {
    val g = TestGraphs.tiny
    assert(g.unionAdj(0).toSeq == Seq(1, 2, 3))
    assert(g.unionAdj(3).toSeq == Seq(0, 2, 4))
    assert(g.unionEdgeCount == 6) // (0,1),(1,2),(0,2),(3,4),(2,3),(0,3)
  }

  test("permuteLayers reorders layers") {
    val g = TestGraphs.tiny
    val p = g.permuteLayers(Array(1, 0))
    assert(p.neighbors(0, 3).toSeq == g.neighbors(1, 3).toSeq)
    assert(p.neighbors(1, 4).toSeq == g.neighbors(0, 4).toSeq)
  }

  test("permuteLayers rejects non-permutations") {
    intercept[IllegalArgumentException](TestGraphs.tiny.permuteLayers(Array(0, 0)))
  }

  test("selectLayers keeps requested layers in order") {
    val g = TestGraphs.random(3, 20, 5, 0.2)
    val sel = g.selectLayers(Seq(4, 1))
    assert(sel.numLayers == 2)
    (0 until 20).foreach { v =>
      assert(sel.neighbors(0, v).toSeq == g.neighbors(4, v).toSeq)
      assert(sel.neighbors(1, v).toSeq == g.neighbors(1, v).toSeq)
    }
  }

  test("induced subgraph keeps internal edges only") {
    val g = TestGraphs.tiny
    val (sub, old) = g.induced(Array(0, 1, 2))
    assert(old.toSeq == Seq(0, 1, 2))
    assert(sub.numVertices == 3)
    assert(sub.edgeCount(0) == 3) // the triangle
    assert(sub.edgeCount(1) == 2) // 0-1, 1-2 (2-3 and 0-3 cut)
  }

  test("induced subgraph re-densifies ids") {
    val g = TestGraphs.tiny
    val (sub, old) = g.induced(Array(2, 4, 0))
    assert(old.toSeq == Seq(0, 2, 4))
    assert(sub.neighbors(0, 0).toSeq == Seq(1)) // old edge (0,2) on layer 0
  }

  test("fromEdges validates layer and vertex bounds") {
    intercept[IllegalArgumentException](MLGraph.fromEdges(1, 3, Seq((1, 0, 1))))
    intercept[IllegalArgumentException](MLGraph.fromEdges(1, 3, Seq((0, 0, 3))))
  }

  test("empty graph has no edges") {
    val g = MLGraph.empty(3, 10)
    assert(g.totalEdgeCount == 0 && g.unionEdgeCount == 0)
  }
}
