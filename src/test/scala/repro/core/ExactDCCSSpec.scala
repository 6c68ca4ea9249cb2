package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs

class ExactDCCSSpec extends AnyFunSuite {

  test("candidates enumerates one core per layer subset of size s") {
    val g = TestGraphs.random(800, 18, 4, 0.25)
    for (s <- 1 to 4) {
      val cands = ExactDCCS.candidates(g, 2, s)
      assert(cands.length == (0 until 4).combinations(s).size)
      cands.foreach { c =>
        assert(c.vertices.toSeq == Dcc.compute(g, c.layers.toArray, 2).toSeq)
      }
    }
  }

  test("bestCover picks the true optimum on a hand-built instance") {
    // sets: {1,2,3}, {3,4}, {5,6,7}; best pair covers 6
    val cands = Vector(
      Core(Vector(0), Array(1, 2, 3)),
      Core(Vector(1), Array(3, 4)),
      Core(Vector(2), Array(5, 6, 7)),
    )
    val (sel, cov) = ExactDCCS.bestCover(cands, 2)
    assert(cov == 6)
    assert(sel.map(_.layers.head).toSet == Set(0, 2))
  }

  test("bestCover with k >= |F| covers everything coverable") {
    val g = TestGraphs.random(801, 15, 3, 0.25)
    val cands = ExactDCCS.candidates(g, 2, 2)
    val (_, cov) = ExactDCCS.bestCover(cands, 10)
    assert(cov == SetOps.coverSize(cands.map(_.vertices)))
  }

  test("optimum at least matches any single candidate") {
    val g = TestGraphs.random(802, 15, 3, 0.3)
    val cands = ExactDCCS.candidates(g, 2, 2)
    val opt = ExactDCCS.optimum(g, 2, 2, 2)
    cands.foreach(c => assert(opt >= c.vertices.length))
  }

  test("empty candidate list") {
    assert(ExactDCCS.bestCover(Vector.empty, 3) == (Vector.empty, 0))
  }
}
