package repro.graphgen

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Dcc, SetOps}

class MLSynthSpec extends AnyFunSuite {

  private lazy val ppi = MLSynth.preset("ppi")
  private lazy val author = MLSynth.preset("author")

  test("generation is deterministic in the seed") {
    val a = MLSynth.generate(MLSynth.presets("ppi"))
    val b = MLSynth.generate(MLSynth.presets("ppi"))
    assert(a.graph.edgeTriples.toSeq == b.graph.edgeTriples.toSeq)
    assert(a.communities.map(_.vertices.toSeq) == b.communities.map(_.vertices.toSeq))
  }

  test("different seeds give different graphs") {
    val a = MLSynth.generate(MLSynth.presets("ppi"))
    val b = MLSynth.generate(MLSynth.presets("ppi").copy(seed = 999L))
    assert(a.graph.edgeTriples.toSeq != b.graph.edgeTriples.toSeq)
  }

  for (name <- Seq("ppi", "author")) {
    test(s"preset '$name' matches its spec dimensions") {
      val gen = MLSynth.preset(name)
      val spec = MLSynth.presets(name)
      assert(gen.graph.numVertices == spec.n)
      assert(gen.graph.numLayers == spec.l)
      assert(gen.communities.length == spec.nCommunities)
      assert(gen.complexes.length == spec.nComplexes)
    }

    test(s"planted communities are dense on their supporting layers ($name)") {
      val gen = MLSynth.preset(name)
      val spec = MLSynth.presets(name)
      gen.communities.foreach { comm =>
        val inSet = comm.vertices.toSet
        comm.layers.foreach { li =>
          comm.vertices.foreach { v =>
            val deg = gen.graph.neighbors(li, v).count(inSet.contains)
            val want = math.min(spec.degTarget, comm.vertices.length - 1)
            assert(deg >= want, s"community vertex $v has degree $deg < $want on layer $li")
          }
        }
      }
    }

    test(s"persistent communities support all layers ($name)") {
      val gen = MLSynth.preset(name)
      val spec = MLSynth.presets(name)
      assert(gen.communities.take(spec.nPersistent)
        .forall(_.layers.length == spec.l))
    }

    test(s"complexes are cliques on their host layers ($name)") {
      val gen = MLSynth.preset(name)
      gen.complexes.foreach { cx =>
        val inSet = cx.vertices.toSet
        cx.layers.foreach { li =>
          cx.vertices.foreach { v =>
            assert(gen.graph.neighbors(li, v).count(inSet.contains) == cx.vertices.length - 1)
          }
        }
      }
    }

    test(s"communities survive as parts of d-cores on supporting layers ($name)") {
      val gen = MLSynth.preset(name)
      val spec = MLSynth.presets(name)
      gen.communities.take(3).foreach { comm =>
        val d = math.min(spec.degTarget, comm.vertices.length - 1)
        comm.layers.take(2).foreach { li =>
          val core = Dcc.compute(gen.graph, Array(li), d)
          assert(SetOps.subsetOf(comm.vertices, core),
            s"community not inside the $d-core of layer $li")
        }
      }
    }
  }

  test("vertex subsampling shrinks the graph proportionally") {
    val g = MLSynth.subsampleVertices(ppi, 0.5)
    assert(g.numLayers == ppi.graph.numLayers)
    assert(math.abs(g.numVertices - ppi.graph.numVertices / 2) < ppi.graph.numVertices / 5)
    assert(g.totalEdgeCount < ppi.graph.totalEdgeCount)
  }

  test("vertex subsampling with p = 1 returns the original graph") {
    assert(MLSynth.subsampleVertices(ppi, 1.0) eq ppi.graph)
  }

  test("layer subsampling keeps round(q*l) layers") {
    val g = MLSynth.subsampleLayers(author, 0.5)
    assert(g.numVertices == author.graph.numVertices)
    assert(g.numLayers == 5)
    assert(MLSynth.subsampleLayers(author, 1.0).numLayers == 10)
  }

  test("all presets generate (smoke, sizes within budget)") {
    MLSynth.presets.keys.foreach { name =>
      val gen = repro.expts.Experiments.dataset(name)
      assert(gen.graph.totalEdgeCount > 0)
      assert(gen.graph.numVertices <= 30000)
    }
  }
}
