package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.expts.{Experiments, Report}

/** T12 / Fig. 29 — comparison between MiMAG (quasi-clique mining) and
  * BU-DCCS on PPI and Author with d = 2, 3, 4 (gamma=0.8, s=l/2, d'=d+1).
  * Paper shape: BU-DCCS is orders of magnitude faster, covers more vertices,
  * strongly overlaps MiMAG's cover (recall 0.75-1.0), and finds a larger
  * proportion of ground-truth complexes.
  */
class MiMAGCompareBench extends AnyFunSuite {

  private lazy val cmps =
    for (name <- Seq("ppi", "author"); d <- Seq(2, 3, 4))
      yield Experiments.mimagCompare(name, d)

  test("T12: MiMAG vs BU-DCCS comparison table") {
    println(Report.mimagCompare(cmps))
    cmps.foreach { c =>
      // BU-DCCS is faster than the quasi-clique miner
      assert(c.buMillis <= c.mimagMillis,
        s"${c.dataset} d=${c.d}: BU ${c.buMillis}ms not faster than MiMAG ${c.mimagMillis}ms")
      // d-CCs cover at least as many vertices as the quasi-cliques
      assert(c.buSize >= c.mimagSize,
        s"${c.dataset} d=${c.d}: BU cover ${c.buSize} < MiMAG cover ${c.mimagSize}")
      // the covers overlap substantially (paper: recall 0.745-1.0)
      assert(c.recall >= 0.3, s"${c.dataset} d=${c.d}: recall ${c.recall} too low")
      // d-CCs find at least as many planted complexes
      assert(c.buProportion >= c.mimagProportion,
        s"${c.dataset} d=${c.d}: proportion ${c.buProportion} < ${c.mimagProportion}")
    }
  }

  test("T12: proportion of found complexes decreases as d grows for BU-DCCS") {
    for (name <- Seq("ppi", "author")) {
      val ps = Seq(2, 4).map(d => cmps.find(c => c.dataset == name && c.d == d).get.buProportion)
      assert(ps(1) <= ps.head + 1e-9, s"$name: proportion grew with d: $ps")
    }
  }
}
